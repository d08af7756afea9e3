package repro.sketch

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Hashing
import repro.sketch.Sketch.SketchConf

/** CSK — Correlation Sketches (Santos et al., SIGMOD 2021) extended to MI
  * (Section V, "Sketching Methods"). CSK does not prescribe repeated-key
  * handling, so on both tables we keep the *first value seen* per key and
  * then the n keys with minimum h_u(k). Coordination is full (same key-level
  * hash on both sides), but the left table's key-frequency structure — which
  * the left join would replicate into the feature column — is lost, which is
  * the estimation bias this baseline demonstrates.
  */
object Csk extends Sketcher {
  val name = "CSK"

  def sketchLeft(df: DataFrame, key: String, value: String, conf: SketchConf): DataFrame =
    oneRowPerKey(df, key, value, conf)

  def sketchRight(df: DataFrame, key: String, value: String, agg: AggFn,
                  conf: SketchConf): DataFrame =
    // agg intentionally ignored: CSK keeps the first value seen rather than
    // applying an aggregation that would modify the original values.
    oneRowPerKey(df, key, value, conf)

  private def oneRowPerKey(df: DataFrame, key: String, value: String,
                           conf: SketchConf): DataFrame = {
    val firsts = Featurize.aggregateNorm(Sketch.normalize(df, key, value), AggFn.First)
    val pre    = Sketcher.pre(firsts, Hashing.huKey(Hashing.SaltKey, col("k")))
    Sketch.topN(pre, conf.n, conf.impl)
  }
}
