package repro.mi

import org.scalatest.funsuite.AnyFunSuite
import repro.stats.Rng

class MleSpec extends AnyFunSuite {
  private def s(xs: String*): IndexedSeq[AnyRef] = xs.toIndexedSeq

  test("entropy of a constant is 0") {
    assert(Mle.entropy(s("a", "a", "a")) == 0.0)
  }

  test("entropy of a uniform pair is ln 2") {
    assert(math.abs(Mle.entropy(s("a", "b", "a", "b")) - math.log(2)) < 1e-12)
  }

  test("entropy of a 1:3 split matches hand computation") {
    val h = -(0.25 * math.log(0.25) + 0.75 * math.log(0.75))
    assert(math.abs(Mle.entropy(s("a", "b", "b", "b")) - h) < 1e-12)
  }

  test("entropyFromCounts ignores zero counts") {
    assert(Mle.entropyFromCounts(Seq(2L, 0L, 2L)) == Mle.entropyFromCounts(Seq(2L, 2L)))
  }

  test("entropy of an empty sample is rejected") {
    intercept[IllegalArgumentException](Mle.entropyFromCounts(Seq.empty[Long]))
  }

  test("MI of independent uniform pair layout is 0") {
    // Each (x, y) combination appears exactly once: empirically independent.
    val xs = s("a", "a", "b", "b")
    val ys = s("c", "d", "c", "d")
    assert(math.abs(Mle.mi(xs, ys)) < 1e-12)
  }

  test("MI of identical columns equals the entropy") {
    val xs = s("a", "b", "c", "a", "b", "c")
    assert(math.abs(Mle.mi(xs, xs) - Mle.entropy(xs)) < 1e-12)
  }

  test("MI is symmetric") {
    val xs = s("a", "a", "b", "c", "c", "c")
    val ys = s("u", "v", "v", "w", "w", "u")
    assert(math.abs(Mle.mi(xs, ys) - Mle.mi(ys, xs)) < 1e-12)
  }

  test("MI is invariant under bijective relabeling") {
    val xs = s("a", "a", "b", "c", "c", "c")
    val ys = s("u", "v", "v", "w", "w", "u")
    val relabeled = xs.map(v => ("z" + v).asInstanceOf[AnyRef])
    assert(math.abs(Mle.mi(xs, ys) - Mle.mi(relabeled, ys)) < 1e-12)
  }

  test("MI upper-bounded by min of marginal entropies") {
    val rng = new Rng(7)
    val xs  = IndexedSeq.fill(500)(("x" + rng.nextInt(7)).asInstanceOf[AnyRef])
    val ys  = IndexedSeq.fill(500)(("y" + rng.nextInt(3)).asInstanceOf[AnyRef])
    val mi  = Mle.mi(xs, ys)
    assert(mi <= Mle.entropy(xs) + 1e-9 && mi <= Mle.entropy(ys) + 1e-9)
  }

  test("MLE MI on independent data is biased upward, roughly (mx-1)(my-1)/2N") {
    // Paper Eq. 6: the plug-in MI over-estimates 0 by ~(m_X·m_Y - m_X - m_Y + 1)/2N
    // when X and Y are independent (m_XY = m_X·m_Y in expectation).
    val rng = new Rng(8)
    val n   = 2000; val mx = 20; val my = 20
    val estimates = (0 until 20).map { _ =>
      val xs = IndexedSeq.fill(n)(("x" + rng.nextInt(mx)).asInstanceOf[AnyRef])
      val ys = IndexedSeq.fill(n)(("y" + rng.nextInt(my)).asInstanceOf[AnyRef])
      Mle.mi(xs, ys)
    }
    val avg      = estimates.sum / estimates.size
    val expected = (mx - 1) * (my - 1) / (2.0 * n)
    assert(avg > 0.5 * expected && avg < 2.0 * expected, s"avg=$avg expected~$expected")
  }

  test("MLE MI converges to the true MI of a known joint") {
    // Joint: P(0,0)=P(1,1)=0.4, P(0,1)=P(1,0)=0.1 => I = sum p ln(p/(px py)).
    val truth = 2 * 0.4 * math.log(0.4 / 0.25) + 2 * 0.1 * math.log(0.1 / 0.25)
    val rng   = new Rng(9)
    val n     = 100000
    val xs = new Array[AnyRef](n); val ys = new Array[AnyRef](n)
    (0 until n).foreach { i =>
      val u = rng.nextDouble()
      val (x, y) = if (u < 0.4) (0, 0) else if (u < 0.8) (1, 1) else if (u < 0.9) (0, 1) else (1, 0)
      xs(i) = Integer.valueOf(x); ys(i) = Integer.valueOf(y)
    }
    assert(math.abs(Mle.mi(xs.toIndexedSeq, ys.toIndexedSeq) - truth) < 0.01)
  }

  test("MI via numeric boxed values works (ordered discrete data)") {
    val xs = IndexedSeq[AnyRef](Double.box(1.0), Double.box(1.0), Double.box(2.0))
    assert(Mle.mi(xs, xs) == Mle.entropy(xs))
  }
}
