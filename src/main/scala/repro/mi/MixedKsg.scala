package repro.mi

import repro.stats.SpecialFunctions.digamma

/** Mixed-KSG estimator (Gao, Kannan, Oh, Viswanath, NeurIPS 2017) for
  * variables that are mixtures of discrete and continuous distributions —
  * the case created by left joins on repeated keys (Section II / III).
  *
  * Follows the authors' reference implementation: for each sample i, let rho
  * be the k-NN distance in the joint l-inf space (self excluded).
  *   rho > 0:  k~ = k;             counts = #{ marginal distance < rho } + self
  *   rho == 0: k~ = #{ joint distance == 0 } + self;
  *             counts = #{ marginal distance == 0 } + self
  *   xi_i = psi(k~) + ln N - psi(n_x) - psi(n_y),   I = max(0, mean xi)
  * In the all-discrete case (rho == 0 everywhere) this recovers the plug-in
  * estimator; in the all-continuous case it reduces to KSG with ln N in place
  * of psi(N).
  */
object MixedKsg {

  def mi(xs: Array[Double], ys: Array[Double], k: Int = MI.DefaultK): Double = {
    val n = xs.length
    require(ys.length == n, "MixedKSG: size mismatch")
    require(n > k + 1, s"MixedKSG needs more than k+1=${k + 1} samples, got $n")
    val logN = math.log(n.toDouble)
    var acc  = 0.0
    val knn  = new Array[Double](k)
    var i    = 0
    while (i < n) {
      java.util.Arrays.fill(knn, Double.PositiveInfinity)
      var j = 0
      while (j < n) {
        if (j != i) {
          val d = math.max(math.abs(xs(j) - xs(i)), math.abs(ys(j) - ys(i)))
          if (d < knn(k - 1)) {
            var p = k - 1
            while (p > 0 && knn(p - 1) > d) { knn(p) = knn(p - 1); p -= 1 }
            knn(p) = d
          }
        }
        j += 1
      }
      val rho = knn(k - 1)
      var kp  = 1 // counts include the point itself, as in the reference impl
      var nx  = 1
      var ny  = 1
      j = 0
      while (j < n) {
        if (j != i) {
          val dx = math.abs(xs(j) - xs(i))
          val dy = math.abs(ys(j) - ys(i))
          if (rho == 0.0) {
            if (dx == 0.0 && dy == 0.0) kp += 1
            if (dx == 0.0) nx += 1
            if (dy == 0.0) ny += 1
          } else {
            if (dx < rho) nx += 1
            if (dy < rho) ny += 1
          }
        }
        j += 1
      }
      val kTilde = if (rho == 0.0) kp else k
      acc += digamma(kTilde.toDouble) + logN - digamma(nx.toDouble) - digamma(ny.toDouble)
      i += 1
    }
    math.max(0.0, acc / n)
  }
}
