package repro.discovery

import org.apache.spark.sql.DataFrame
import repro.mi.MI
import repro.sketch.{AggFn, Sketch, Sketcher, TupSk}

/** The end-to-end discovery query the sketches exist to serve (Section I):
  * given a base table with a target column, rank candidate joinable tables by
  * the estimated MI between their feature column and the target — without
  * materializing any join. The base table is sketched once; each candidate
  * contributes one small sketch and one sketch-join.
  */
object JoinRanker {

  final case class Candidate(name: String, df: DataFrame, key: String, value: String,
                             agg: AggFn = AggFn.First)

  final case class Ranked(name: String, estimatedMI: Double, sketchJoinSize: Int,
                          estimator: String)

  /** Rank candidates by sketch-estimated MI (descending). Candidates whose
    * sketch-join is too small to estimate (< minJoin rows) rank last with
    * NaN estimates, mirroring the paper's "discard meaningless estimates".
    */
  def rank(train: DataFrame, trainKey: String, target: String,
           candidates: Seq[Candidate], conf: Sketch.SketchConf,
           sketcher: Sketcher = TupSk, minJoin: Int = 10): Seq[Ranked] = {
    val left = sketcher.sketchLeft(train, trainKey, target, conf).cache()
    try {
      left.count() // materialize once; every candidate reuses it
      val ranked = candidates.map { c =>
        val right  = sketcher.sketchRight(c.df, c.key, c.value, c.agg, conf)
        val sample = Sketch.collectSample(Sketch.join(left, right))
        val kind   = MI.auto(sample.x, sample.y)
        val est =
          if (sample.size < minJoin) Double.NaN
          else MI.estimate(kind, sample.x, sample.y)
        Ranked(c.name, est, sample.size, kind.name)
      }
      ranked.sortBy(r => if (r.estimatedMI.isNaN) Double.NegativeInfinity else r.estimatedMI)(
        Ordering[Double].reverse)
    } finally left.unpersist()
  }
}
