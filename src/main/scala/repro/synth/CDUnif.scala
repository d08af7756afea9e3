package repro.synth

import repro.stats.Rng

/** The paper's CDUnif synthetic distribution (Section V-A, after Gao et al.):
  * X ~ Unif{0, .., m-1} (discrete), Y | X ~ Unif[X, X+2] (continuous).
  * True MI (nats): I(X;Y) = ln(m) - (m-1)·ln(2)/m.
  */
object CDUnif {

  def trueMI(m: Int): Double = {
    require(m >= 2, s"CDUnif needs m >= 2, got $m")
    math.log(m.toDouble) - (m - 1).toDouble * math.log(2.0) / m
  }

  def sample(rng: Rng, m: Int, nRows: Int): (Array[Int], Array[Double]) = {
    val xs = new Array[Int](nRows)
    val ys = new Array[Double](nRows)
    var i  = 0
    while (i < nRows) {
      val x = rng.nextInt(m)
      xs(i) = x
      ys(i) = x + 2.0 * rng.nextDouble()
      i += 1
    }
    (xs, ys)
  }
}
