package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.mi.Mle
import repro.stats.Rng
import repro.stats.SpecialFunctions.logFactorials

class TrinomialSpec extends AnyFunSuite {

  test("solver returns parameters in the paper's ranges") {
    val rng = new Rng(1)
    (0 until 200).foreach { _ =>
      val p = Trinomial.solveParams(rng, 256)
      assert(p.p1 >= 0.15 && p.p1 <= 0.85)
      assert(p.p2 >= 0.15 && p.p2 <= 0.85)
      assert(p.p1 + p.p2 < 1.0)
      assert(p.targetMI >= 0 && p.targetMI <= 3.5)
    }
  }

  test("solver satisfies the correlation identity r^2 = p1p2/((1-p1)(1-p2))") {
    val rng = new Rng(2)
    (0 until 50).foreach { _ =>
      val p  = Trinomial.solveParams(rng, 512)
      val r2 = 1.0 - math.exp(-2.0 * p.targetMI)
      val c2 = p.p1 * p.p2 / ((1 - p.p1) * (1 - p.p2))
      assert(math.abs(r2 - c2) < 1e-9, s"r2=$r2 c2=$c2")
    }
  }

  test("binomial entropy hand checks") {
    assert(math.abs(Trinomial.binomialEntropy(1, 0.5) - math.log(2)) < 1e-12)
    val h2 = -(0.5 * math.log(0.5) + 2 * 0.25 * math.log(0.25))
    assert(math.abs(Trinomial.binomialEntropy(2, 0.5) - h2) < 1e-12)
    assert(Trinomial.binomialEntropy(100, 0.0) == 0.0)
  }

  test("binomial entropy matches the Gaussian asymptotic 0.5 ln(2 pi e npq)") {
    val m = 4096; val p = 0.5
    val asym = 0.5 * math.log(2 * math.Pi * math.E * m * p * (1 - p))
    assert(math.abs(Trinomial.binomialEntropy(m, p) - asym) < 1e-3)
  }

  test("joint entropy for m=1 equals the categorical entropy of (p1,p2,p3)") {
    val (p1, p2) = (0.2, 0.3); val p3 = 0.5
    val h = -(p1 * math.log(p1) + p2 * math.log(p2) + p3 * math.log(p3))
    assert(math.abs(Trinomial.jointEntropy(1, p1, p2) - h) < 1e-12)
  }

  test("exact MI matches a direct pmf enumeration for small m") {
    val lf = logFactorials(6)
    def direct(m: Int, p1: Double, p2: Double): Double = {
      val p3 = 1 - p1 - p2
      def pmf(i: Int, j: Int) =
        math.exp(lf(m) - lf(i) - lf(j) - lf(m - i - j)) *
          math.pow(p1, i) * math.pow(p2, j) * math.pow(p3, m - i - j)
      val px = (0 to m).map(i => (0 to m - i).map(j => pmf(i, j)).sum)
      val py = (0 to m).map(j => (0 to m - j).map(i => pmf(i, j)).sum)
      var mi = 0.0
      for (i <- 0 to m; j <- 0 to m - i) {
        val p = pmf(i, j)
        if (p > 1e-300) mi += p * math.log(p / (px(i) * py(j)))
      }
      mi
    }
    for ((m, p1, p2) <- Seq((2, 0.3, 0.4), (4, 0.2, 0.5), (6, 0.45, 0.45))) {
      val exact = Trinomial.exactMI(TrinomialParams(m, p1, p2, 0.0))
      assert(math.abs(exact - direct(m, p1, p2)) < 1e-9, s"m=$m")
    }
  }

  test("exact MI is non-negative and bounded by marginal entropies") {
    val rng = new Rng(3)
    (0 until 10).foreach { _ =>
      val p  = Trinomial.solveParams(rng, 64)
      val mi = Trinomial.exactMI(p)
      assert(mi >= 0)
      assert(mi <= Trinomial.binomialEntropy(p.m, p.p1) + 1e-9)
      assert(mi <= Trinomial.binomialEntropy(p.m, p.p2) + 1e-9)
    }
  }

  test("exact MI tracks the bivariate-normal target for moderate m") {
    // The solver *targets* -0.5 ln(1-r^2); the CLT makes the exact value
    // approach the target as m grows (Section V-A).
    val rng = new Rng(4)
    val diffs = (0 until 15).map { _ =>
      val p = Trinomial.solveParams(rng, 512, maxMI = 2.0)
      math.abs(Trinomial.exactMI(p) - p.targetMI)
    }
    assert(diffs.sum / diffs.size < 0.12, s"avg diff=${diffs.sum / diffs.size}")
  }

  test("sampler marginals have binomial mean and variance") {
    val rng = new Rng(5)
    val p   = TrinomialParams(100, 0.3, 0.4, 0.0)
    val (xs, ys) = Trinomial.sample(rng, p, 20000)
    def meanVar(a: Array[Int]) = {
      val m = a.map(_.toDouble).sum / a.length
      (m, a.map(v => (v - m) * (v - m)).sum / a.length)
    }
    val (mx, vx) = meanVar(xs); val (my, vy) = meanVar(ys)
    assert(math.abs(mx - 30.0) < 0.3, s"mx=$mx"); assert(math.abs(vx - 21.0) < 1.0, s"vx=$vx")
    assert(math.abs(my - 40.0) < 0.3, s"my=$my"); assert(math.abs(vy - 24.0) < 1.2, s"vy=$vy")
  }

  test("sampler produces negatively correlated counts (trinomial property)") {
    val rng = new Rng(6)
    val p   = TrinomialParams(50, 0.4, 0.4, 0.0)
    val (xs, ys) = Trinomial.sample(rng, p, 20000)
    val r = repro.stats.Stats.pearson(xs.map(_.toDouble).toSeq, ys.map(_.toDouble).toSeq)
    val expected = -p.p1 * p.p2 / math.sqrt(p.p1 * (1 - p.p1) * p.p2 * (1 - p.p2))
    assert(math.abs(r - expected) < 0.03, s"r=$r expected=$expected")
  }

  test("plug-in MI on a large sample approaches the exact MI") {
    val rng = new Rng(7)
    val p   = Trinomial.solveParams(rng, 16, maxMI = 1.5)
    val (xs, ys) = Trinomial.sample(rng, p, 100000)
    val est = Mle.mi(xs.map(Integer.valueOf(_): AnyRef).toIndexedSeq,
                     ys.map(Integer.valueOf(_): AnyRef).toIndexedSeq)
    assert(math.abs(est - Trinomial.exactMI(p)) < 0.05,
      s"est=$est exact=${Trinomial.exactMI(p)}")
  }

  test("m sweep values match the paper") {
    assert(Trinomial.MValues == Seq(16, 64, 256, 512, 1024))
  }
}
