package repro.stats

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("same seed reproduces the same stream") {
    val a = new Rng(42); val b = new Rng(42)
    assert(Seq.fill(100)(a.nextDouble()) == Seq.fill(100)(b.nextDouble()))
  }

  test("uniform respects bounds") {
    val r = new Rng(1)
    (0 until 10000).foreach { _ =>
      val u = r.uniform(2.0, 5.0); assert(u >= 2.0 && u < 5.0)
    }
  }

  test("gaussian has ~0 mean and ~unit variance") {
    val r  = new Rng(2)
    val xs = Array.fill(50000)(r.nextGaussian())
    val m  = xs.sum / xs.length
    val v  = xs.map(x => (x - m) * (x - m)).sum / xs.length
    assert(math.abs(m) < 0.02, s"mean=$m")
    assert(math.abs(v - 1.0) < 0.05, s"var=$v")
  }

  test("binomial has mean np and variance npq") {
    val r = new Rng(3)
    val n = 100; val p = 0.3
    val xs = Array.fill(20000)(r.binomial(n, p).toDouble)
    val m  = xs.sum / xs.length
    val v  = xs.map(x => (x - m) * (x - m)).sum / xs.length
    assert(math.abs(m - n * p) < 0.3, s"mean=$m")
    assert(math.abs(v - n * p * (1 - p)) < 1.0, s"var=$v")
  }

  test("binomial edge cases p=0 and p=1") {
    val r = new Rng(4)
    assert(r.binomial(50, 0.0) == 0)
    assert(r.binomial(50, 1.0) == 50)
  }

  test("zipf cdf is monotone and ends at 1") {
    val cdf = Rng.zipfCdf(100, 1.1)
    assert(cdf.last == 1.0)
    cdf.zip(cdf.tail).foreach { case (a, b) => assert(a <= b) }
  }

  test("zipf draws respect the rank distribution (rank 1 most frequent)") {
    val r   = new Rng(5)
    val cdf = Rng.zipfCdf(50, 1.0)
    val draws = Array.fill(20000)(r.zipf(cdf))
    assert(draws.forall(d => d >= 1 && d <= 50))
    val c1 = draws.count(_ == 1); val c50 = draws.count(_ == 50)
    assert(c1 > 5 * c50, s"rank1=$c1 rank50=$c50")
  }

  test("zipf alpha=0 is uniform over ranks") {
    val r     = new Rng(6)
    val cdf   = Rng.zipfCdf(10, 0.0)
    val draws = Array.fill(50000)(r.zipf(cdf))
    val counts = (1 to 10).map(k => draws.count(_ == k))
    counts.foreach(c => assert(math.abs(c - 5000) < 400, s"counts=$counts"))
  }
}
