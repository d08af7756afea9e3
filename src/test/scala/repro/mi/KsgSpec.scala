package repro.mi

import org.scalatest.funsuite.AnyFunSuite
import repro.stats.Rng

class KsgSpec extends AnyFunSuite {

  private def gaussianPair(rng: Rng, n: Int, r: Double): (Array[Double], Array[Double]) = {
    val xs = new Array[Double](n); val ys = new Array[Double](n)
    (0 until n).foreach { i =>
      val z1 = rng.nextGaussian(); val z2 = rng.nextGaussian()
      xs(i) = z1; ys(i) = r * z1 + math.sqrt(1 - r * r) * z2
    }
    (xs, ys)
  }

  test("KSG on independent Gaussians is ~0") {
    val (xs, ys) = gaussianPair(new Rng(1), 2000, 0.0)
    assert(Ksg.mi(xs, ys) < 0.05)
  }

  test("KSG recovers the analytic MI of a correlated bivariate Gaussian") {
    for (r <- Seq(0.5, 0.9)) {
      val (xs, ys) = gaussianPair(new Rng(2), 3000, r)
      val truth    = -0.5 * math.log(1 - r * r)
      val est      = Ksg.mi(xs, ys)
      assert(math.abs(est - truth) < 0.1, s"r=$r est=$est truth=$truth")
    }
  }

  test("KSG is invariant under strictly monotone transforms") {
    val (xs, ys) = gaussianPair(new Rng(3), 2000, 0.7)
    val a = Ksg.mi(xs, ys)
    val b = Ksg.mi(xs.map(x => math.exp(x)), ys.map(y => 5 * y - 3))
    assert(math.abs(a - b) < 0.08, s"a=$a b=$b")
  }

  test("KSG estimate grows with dependence strength") {
    val ests = Seq(0.0, 0.5, 0.9, 0.99).map { r =>
      val (xs, ys) = gaussianPair(new Rng(4), 1500, r)
      Ksg.mi(xs, ys)
    }
    ests.zip(ests.tail).foreach { case (a, b) => assert(a < b, s"ests=$ests") }
  }

  test("KSG with different k stays near the truth") {
    val (xs, ys) = gaussianPair(new Rng(5), 2500, 0.8)
    val truth    = -0.5 * math.log(1 - 0.64)
    for (k <- Seq(1, 3, 5, 10))
      assert(math.abs(Ksg.mi(xs, ys, k) - truth) < 0.15, s"k=$k")
  }

  test("KSG rejects tiny samples") {
    intercept[IllegalArgumentException](Ksg.mi(Array(1.0, 2.0), Array(1.0, 2.0), 3))
  }

  test("KSG never returns a negative estimate") {
    val rng = new Rng(6)
    val xs  = Array.fill(300)(rng.nextDouble())
    val ys  = Array.fill(300)(rng.nextDouble())
    assert(Ksg.mi(xs, ys) >= 0.0)
  }
}
