package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.stats.Rng

class CDUnifSpec extends AnyFunSuite {

  test("analytic MI formula hand checks") {
    // I = ln m - (m-1) ln 2 / m : for m=2, ln2 - ln2/2 = ln2/2.
    assert(math.abs(CDUnif.trueMI(2) - math.log(2) / 2) < 1e-12)
    assert(math.abs(CDUnif.trueMI(1000) - (math.log(1000.0) - 999 * math.log(2.0) / 1000)) < 1e-12)
  }

  test("analytic MI is increasing in m") {
    val mis = Seq(2, 4, 16, 256, 1000).map(CDUnif.trueMI)
    mis.zip(mis.tail).foreach { case (a, b) => assert(a < b) }
  }

  test("m=256 gives MI ~4.85 as stated in Section V-B4") {
    assert(math.abs(CDUnif.trueMI(256) - 4.85) < 0.01, s"got ${CDUnif.trueMI(256)}")
  }

  test("numeric integration of the mixture density matches the formula") {
    // H(Y) = ln m + ln2/m (piecewise-constant density); I = H(Y) - ln 2.
    for (m <- Seq(3, 7, 50)) {
      val hy = math.log(m.toDouble) + math.log(2.0) / m
      assert(math.abs((hy - math.log(2.0)) - CDUnif.trueMI(m)) < 1e-12, s"m=$m")
    }
  }

  test("sampler respects supports") {
    val (xs, ys) = CDUnif.sample(new Rng(1), 10, 5000)
    assert(xs.forall(x => x >= 0 && x < 10))
    xs.zip(ys).foreach { case (x, y) => assert(y >= x && y < x + 2) }
  }

  test("sampler X marginal is uniform") {
    val (xs, _) = CDUnif.sample(new Rng(2), 5, 50000)
    (0 until 5).foreach { v =>
      assert(math.abs(xs.count(_ == v) - 10000) < 500, s"v=$v count=${xs.count(_ == v)}")
    }
  }

  test("sampler Y conditional mean is X + 1") {
    val (xs, ys) = CDUnif.sample(new Rng(3), 4, 40000)
    (0 until 4).foreach { v =>
      val sel = xs.zip(ys).filter(_._1 == v).map(_._2)
      val m   = sel.sum / sel.length
      assert(math.abs(m - (v + 1.0)) < 0.03, s"v=$v mean=$m")
    }
  }

  test("trueMI rejects m < 2") {
    intercept[IllegalArgumentException](CDUnif.trueMI(1))
  }
}
