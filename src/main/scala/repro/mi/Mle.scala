package repro.mi

import scala.collection.mutable

/** Maximum likelihood ("plug-in") estimators of entropy and MI for discrete
  * data (Section II). Entropies are in nats. The estimator is known to be
  * biased (Eq. 6 of the paper: bias ~ (m_X + m_Y - m_XY - 1) / 2N for MI);
  * tests assert the direction of that bias, and the Table I experiment
  * reproduces its blow-up as the number of distinct values m grows.
  */
object Mle {

  /** Empirical entropy from category counts. */
  def entropyFromCounts(counts: Iterable[Long]): Double = {
    val n = counts.sum.toDouble
    require(n > 0, "entropy of an empty sample")
    var h = 0.0
    counts.foreach { c =>
      if (c > 0) { val p = c / n; h -= p * math.log(p) }
    }
    h
  }

  /** Empirical entropy of a sample (values compared by equality). */
  def entropy(xs: IndexedSeq[AnyRef]): Double =
    entropyFromCounts(countBy(xs).values)

  /** Plug-in MI: H(X) + H(Y) - H(X,Y); non-negative up to fp rounding. */
  def mi(xs: IndexedSeq[AnyRef], ys: IndexedSeq[AnyRef]): Double = {
    require(xs.size == ys.size, "MLE MI: size mismatch")
    val joint = mutable.HashMap.empty[(AnyRef, AnyRef), Long]
    var i     = 0
    while (i < xs.size) {
      val key = (xs(i), ys(i))
      joint.update(key, joint.getOrElse(key, 0L) + 1L)
      i += 1
    }
    val hx  = entropy(xs)
    val hy  = entropy(ys)
    val hxy = entropyFromCounts(joint.values)
    math.max(0.0, hx + hy - hxy)
  }

  private def countBy(xs: IndexedSeq[AnyRef]): mutable.HashMap[AnyRef, Long] = {
    val m = mutable.HashMap.empty[AnyRef, Long]
    var i = 0
    while (i < xs.size) { m.update(xs(i), m.getOrElse(xs(i), 0L) + 1L); i += 1 }
    m
  }
}
