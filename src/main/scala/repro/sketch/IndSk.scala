package repro.sketch

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Hashing
import repro.sketch.Sketch.SketchConf

/** INDSK — independent Bernoulli sampling baseline (Section V, "Sketching
  * Methods"): each table keeps n uniformly random rows chosen by hashes with
  * *different* salts, so the samples are uncoordinated. Joining two such
  * samples recovers quadratically fewer join rows (Section IV), which is the
  * failure mode this baseline demonstrates.
  */
object IndSk extends Sketcher {
  val name = "INDSK"

  def sketchLeft(df: DataFrame, key: String, value: String, conf: SketchConf): DataFrame = {
    val withJ = Sketch.withOccurrence(Sketch.normalize(df, key, value))
    val pre   = Sketcher.pre(withJ, Hashing.huTuple(Hashing.SaltIndLeft, col("k"), col("j")))
    Sketch.topN(pre, conf.n, conf.impl)
  }

  def sketchRight(df: DataFrame, key: String, value: String, agg: AggFn,
                  conf: SketchConf): DataFrame = {
    val aggd = Featurize.aggregateNorm(Sketch.normalize(df, key, value), agg)
    val pre  = Sketcher.pre(aggd, Hashing.huKey(Hashing.SaltIndRight, col("k")))
    Sketch.topN(pre, conf.n, conf.impl)
  }
}
