package repro.synth

import repro.stats.Rng
import repro.stats.SpecialFunctions.logFactorials

/** The paper's Trinomial synthetic distribution (Section V-A):
  * (X, Y, ·) ~ Mult(m, ⟨p1, p2, 1-p1-p2⟩); X and Y are the first two counts.
  *
  * Parameters (p1, p2) are solved from a target MI through the
  * bivariate-normal approximation r = sqrt(1 - exp(-2·I)) and the trinomial
  * correlation |r| = sqrt(p1·p2 / ((1-p1)(1-p2))); the *true* MI is then
  * computed exactly from the open-form trinomial entropy formulas.
  */
final case class TrinomialParams(m: Int, p1: Double, p2: Double, targetMI: Double) {
  require(p1 > 0 && p2 > 0 && p1 + p2 < 1, s"invalid trinomial params ($p1, $p2)")
}

object Trinomial {

  /** Paper's m values for the Table I / Figure 4 sweep. */
  val MValues: Seq[Int] = Seq(16, 64, 256, 512, 1024)

  /** Solve distribution parameters for a target MI drawn ~ Unif(0, maxMI),
    * following the paper's rejection loop (p1, p2 both within [0.15, 0.85]).
    */
  def solveParams(rng: Rng, m: Int, maxMI: Double = 3.5): TrinomialParams = {
    var attempt = 0
    while (attempt < 10000) {
      val iTrue = rng.uniform(0.0, maxMI)
      val r2    = 1.0 - math.exp(-2.0 * iTrue)
      val p1    = rng.uniform(0.15, 0.85)
      // r^2 = p1 p2 / ((1-p1)(1-p2))  =>  p2/(1-p2) = r^2 (1-p1)/p1
      val a  = r2 * (1.0 - p1) / p1
      val p2 = a / (1.0 + a)
      if (p2 >= 0.15 && p2 <= 0.85 && p1 + p2 < 1.0 - 1e-9)
        return TrinomialParams(m, p1, p2, iTrue)
      attempt += 1
    }
    throw new IllegalStateException(s"trinomial parameter solver failed to converge for m=$m")
  }

  /** Entropy (nats) of Binomial(m, p) by direct summation over log-pmf. */
  def binomialEntropy(m: Int, p: Double): Double = {
    if (p <= 0.0 || p >= 1.0) return 0.0
    val lf  = logFactorials(m)
    val lp  = math.log(p); val lq = math.log(1.0 - p)
    var h   = 0.0
    var i   = 0
    while (i <= m) {
      val logPmf = lf(m) - lf(i) - lf(m - i) + i * lp + (m - i) * lq
      if (logPmf > -45.0) h -= math.exp(logPmf) * logPmf
      i += 1
    }
    h
  }

  /** Joint entropy (nats) of the first two trinomial counts, by summation
    * over the O(m^2) support (m <= 1024 => ~0.5M terms).
    */
  def jointEntropy(m: Int, p1: Double, p2: Double): Double = {
    val p3 = 1.0 - p1 - p2
    require(p3 > 0, "degenerate trinomial")
    val lf  = logFactorials(m)
    val lp1 = math.log(p1); val lp2 = math.log(p2); val lp3 = math.log(p3)
    var h   = 0.0
    var i   = 0
    while (i <= m) {
      var j = 0
      val rest = m - i
      while (j <= rest) {
        val kk     = m - i - j
        val logPmf = lf(m) - lf(i) - lf(j) - lf(kk) + i * lp1 + j * lp2 + kk * lp3
        if (logPmf > -45.0) h -= math.exp(logPmf) * logPmf
        j += 1
      }
      i += 1
    }
    h
  }

  /** Exact true MI (nats) between the first two trinomial counts. */
  def exactMI(params: TrinomialParams): Double = {
    val hx  = binomialEntropy(params.m, params.p1)
    val hy  = binomialEntropy(params.m, params.p2)
    val hxy = jointEntropy(params.m, params.p1, params.p2)
    math.max(0.0, hx + hy - hxy)
  }

  /** Draw nRows samples of (X, Y): X ~ Bin(m, p1), Y | X ~ Bin(m-X, p2/(1-p1)).
    * This two-stage decomposition is the exact multinomial law.
    */
  def sample(rng: Rng, params: TrinomialParams, nRows: Int): (Array[Int], Array[Int]) = {
    val xs = new Array[Int](nRows)
    val ys = new Array[Int](nRows)
    val pc = params.p2 / (1.0 - params.p1)
    var i  = 0
    while (i < nRows) {
      val x = rng.binomial(params.m, params.p1)
      xs(i) = x
      ys(i) = rng.binomial(params.m - x, pc)
      i += 1
    }
    (xs, ys)
  }
}
