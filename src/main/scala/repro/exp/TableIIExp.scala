package repro.exp

import org.apache.spark.sql.functions._
import org.apache.spark.sql.SparkSession
import repro.mi.{ColData, EstimatorKind, MI, MleSpark, NumCol, StrCol}
import repro.sketch.{AggFn, Lv2Sk, PriSk, Sketch, Sketcher, TupSk}
import repro.stats.{Rng, Stats}
import repro.synth.OpenDataGen

/** Table II experiment (Section V-C1): over a collection of table pairs,
  * compare sketch MI estimates (n = 1024) against the MI estimated on the
  * full join (the only available ground-truth proxy on real data). Reports
  * per sketching scheme the average sketch-join size, Spearman's rank
  * correlation between sketch and full-join estimates, and MSE — keeping only
  * estimates whose sketch-join exceeds 100 rows, as the paper does.
  */
object TableIIExp {

  final case class Rec(collection: String, pairId: Int, sketch: String, estimator: String,
                       fullJoinSize: Long, fullMI: Double,
                       sketchJoinSize: Int, sketchMI: Double)

  final case class SummaryRow(collection: String, sketch: String,
                              avgJoinSize: Double, spearman: Double, mse: Double,
                              nPairs: Int)

  val SketchN     = 1024
  val MinJoinSize = 100
  /** Cap on rows fed to the O(N^2) KSG-family full-join estimates. */
  val MaxFullEst  = 5000

  val sketchers: Seq[Sketcher] = Seq(Lv2Sk, PriSk, TupSk)

  def run(spark: SparkSession, collection: String, nPairs: Int = 120,
          n: Int = SketchN, seed: Long = 11,
          impl: Sketch.TopNImpl = Sketch.TopNImpl.Udaf): Seq[Rec] = {
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    val conf = Sketch.SketchConf(n, impl)
    val out  = Seq.newBuilder[Rec]
    for (spec <- OpenDataGen.specs(collection, nPairs, seed)) {
      val pair = OpenDataGen.generate(spark, spec)
      pair.train.cache(); pair.cand.cache()
      try {
        val agg  = if (spec.xNumeric) AggFn.Avg else AggFn.Mode
        val kind = dispatch(spec.xNumeric, spec.yNumeric)

        // Full-join reference estimate.
        val joined = repro.sketch.Featurize
          .augmentedJoin(pair.train, "k", "y", pair.cand, "k", "x", agg)
          .filter(col("xn").isNotNull || col("xstr").isNotNull)
          .cache()
        val (fullSize, fullMI) =
          try (joined.count(), fullEstimate(spark, joined, spec, kind, seed))
          finally joined.unpersist()

        // Sketch estimates.
        for (sk <- sketchers) {
          val left   = sk.sketchLeft(pair.train, "k", "y", conf)
          val right  = sk.sketchRight(pair.cand, "k", "x", agg, conf)
          val sample = Sketch.collectSample(Sketch.join(left, right))
          val est =
            if (sample.size < 2) Double.NaN
            else MI.estimate(kind, sample.x, sample.y)
          out += Rec(collection, spec.id, sk.name, kind.name, fullSize, fullMI, sample.size, est)
        }
      } finally { pair.train.unpersist(); pair.cand.unpersist() }
    }
    out.result()
  }

  /** Estimator choice by column types (Section V, "MI Estimators"). */
  def dispatch(xNumeric: Boolean, yNumeric: Boolean): EstimatorKind = (xNumeric, yNumeric) match {
    case (false, false) => EstimatorKind.MLE
    case (true, true)   => EstimatorKind.MixedKSG
    case _              => EstimatorKind.DCKSG
  }

  private def fullEstimate(spark: SparkSession,
                           joined: org.apache.spark.sql.DataFrame,
                           spec: OpenDataGen.PairSpec, kind: EstimatorKind,
                           seed: Long): Double = {
    if (kind == EstimatorKind.MLE) {
      // Discrete-discrete: distributed plug-in estimate, no collection needed.
      MleSpark.mi(joined.select(col("xstr") as "x", col("y")), "x", "y")
    } else {
      val xCol = if (spec.xNumeric) "xn" else "xstr"
      val rows = joined.select(col(xCol), col("y")).collect()
      val rng  = new Rng(seed * 31 + spec.id)
      val idx =
        if (rows.length <= MaxFullEst) rows.indices.toArray
        else Array.fill(MaxFullEst)(rng.nextInt(rows.length))
      val x: ColData =
        if (spec.xNumeric) NumCol(idx.map(i => rows(i).getDouble(0)))
        else StrCol(idx.map(i => rows(i).getString(0)))
      val y: ColData =
        if (spec.yNumeric) NumCol(idx.map(i => rows(i).getDouble(1)))
        else StrCol(idx.map(i => rows(i).getString(1)))
      MI.estimate(kind, x, y)
    }
  }

  /** Aggregate per sketch over pairs with sketch-join > 100 and defined
    * estimates on both sides, as in Table II.
    */
  def summarize(recs: Seq[Rec]): Seq[SummaryRow] = {
    recs.groupBy(r => (r.collection, r.sketch)).toSeq.sortBy(_._1).map {
      case ((coll, sk), rs0) =>
        val rs = rs0.filter(r =>
          r.sketchJoinSize > MinJoinSize && !r.fullMI.isNaN && !r.sketchMI.isNaN)
        val est  = rs.map(_.sketchMI)
        val ref  = rs.map(_.fullMI)
        SummaryRow(coll, sk,
          avgJoinSize = Stats.mean(rs.map(_.sketchJoinSize.toDouble)),
          spearman    = Stats.spearman(est, ref),
          mse         = Stats.mse(est, ref),
          nPairs      = rs.size)
    }
  }

  def format(rows: Seq[SummaryRow]): String = {
    val header = f"${"Dataset"}%-8s ${"Sketch"}%-6s ${"AvgJoinSize"}%12s ${"SpearmanR"}%10s ${"MSE"}%8s ${"#pairs"}%7s"
    val lines = rows.map { r =>
      f"${r.collection}%-8s ${r.sketch}%-6s ${r.avgJoinSize}%12.1f ${r.spearman}%10.2f ${r.mse}%8.2f ${r.nPairs}%7d"
    }
    (header +: lines).mkString("\n")
  }
}
