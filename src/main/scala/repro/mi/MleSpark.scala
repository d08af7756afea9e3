package repro.mi

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** The plug-in (MLE) MI estimator expressed as DataFrame aggregations, so the
  * full-join estimate can be computed distributed without collecting rows.
  * Oracle-checked against an equivalent DuckDB SQL formulation in tests.
  */
object MleSpark {

  /** Empirical entropy (nats) of column `col` of `df`, ignoring NULLs. */
  def entropy(df: DataFrame, col: String): Double = {
    val counts = df.filter(df(col).isNotNull).groupBy(col).agg(count(lit(1)) as "c")
    entropyOfCounts(counts, "c")
  }

  /** Plug-in MI (nats) between two columns of `df`; rows with a NULL on
    * either side are discarded (the paper discards left-join misses).
    */
  def mi(df: DataFrame, xCol: String, yCol: String): Double = {
    val clean = df.filter(df(xCol).isNotNull && df(yCol).isNotNull)
    // One shuffle for the joint counts; marginals re-aggregate the (small)
    // joint table instead of rescanning the input.
    val joint = clean.groupBy(xCol, yCol).agg(count(lit(1)) as "c").cache()
    try {
      val hxy = entropyOfCounts(joint, "c")
      val hx  = entropyOfCounts(joint.groupBy(xCol).agg(sum("c") as "c"), "c")
      val hy  = entropyOfCounts(joint.groupBy(yCol).agg(sum("c") as "c"), "c")
      math.max(0.0, hx + hy - hxy)
    } finally joint.unpersist()
  }

  /** -sum (c/n)·ln(c/n) over a counts column, as a single Spark aggregate. */
  private def entropyOfCounts(counts: DataFrame, c: String): Double = {
    val row = counts
      .agg(sum(col(c)) as "n", sum(col(c) * log(col(c))) as "clogc")
      .first()
    if (row.isNullAt(0)) return Double.NaN
    val n     = row.getLong(0).toDouble
    val clogc = row.getDouble(1)
    // H = ln n - (1/n)·sum c·ln c
    math.log(n) - clogc / n
  }
}
