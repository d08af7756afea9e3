package repro.sketch

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Featurization functions AGG (Section III-B): derive the augmentation table
  * `T_aug[K_X, X]` from a candidate `T_cand[K_Z, Z]` whose keys repeat.
  */
sealed trait AggFn { def name: String }
object AggFn {
  /** First value seen per key, in row order — CSK's repeated-key handling. */
  case object First extends AggFn { val name = "FIRST" }
  case object Avg   extends AggFn { val name = "AVG"   }
  case object Count extends AggFn { val name = "COUNT" }
  /** Most frequent value; ties broken by smallest value, for determinism. */
  case object Mode  extends AggFn { val name = "MODE"  }
  case object Max   extends AggFn { val name = "MAX"   }
  case object Min   extends AggFn { val name = "MIN"   }
}

object Featurize {

  /** Aggregate a normalized table `[k, vNum, vStr, rid]` to one row per key,
    * keeping the normalized value representation: `[k, vNum, vStr, rid]`
    * (rid = smallest source rid of the group, so downstream occurrence
    * numbering stays deterministic).
    */
  def aggregateNorm(norm: DataFrame, agg: AggFn): DataFrame = {
    val numeric = agg match {
      case AggFn.Avg | AggFn.Count | AggFn.Max | AggFn.Min => true
      case _                                               => false
    }
    agg match {
      case AggFn.First =>
        norm
          .groupBy("k")
          .agg(
            min_by(col("vNum"), col("rid")) as "vNum",
            min_by(col("vStr"), col("rid")) as "vStr",
            min("rid") as "rid",
          )
      case AggFn.Avg =>
        requireNumeric(norm, agg)
        norm.groupBy("k").agg(avg("vNum") as "vNum", min("rid") as "rid")
          .select(col("k"), col("vNum"), lit(null).cast("string") as "vStr", col("rid"))
      case AggFn.Count =>
        norm.groupBy("k").agg(count(lit(1)).cast("double") as "vNum", min("rid") as "rid")
          .select(col("k"), col("vNum"), lit(null).cast("string") as "vStr", col("rid"))
      case AggFn.Max =>
        requireNumeric(norm, agg)
        norm.groupBy("k").agg(max("vNum") as "vNum", min("rid") as "rid")
          .select(col("k"), col("vNum"), lit(null).cast("string") as "vStr", col("rid"))
      case AggFn.Min =>
        requireNumeric(norm, agg)
        norm.groupBy("k").agg(min("vNum") as "vNum", min("rid") as "rid")
          .select(col("k"), col("vNum"), lit(null).cast("string") as "vStr", col("rid"))
      case AggFn.Mode =>
        // Count each (k, value) pair, then keep the most frequent value per
        // key; ties broken by the smaller value for determinism.
        val counts = norm
          .groupBy("k", "vNum", "vStr")
          .agg(count(lit(1)) as "cnt", min("rid") as "rid")
        val w = Window
          .partitionBy("k")
          .orderBy(col("cnt").desc, col("vNum").asc_nulls_last, col("vStr").asc_nulls_last)
        counts
          .withColumn("rank", row_number().over(w))
          .filter(col("rank") === 1)
          .select("k", "vNum", "vStr", "rid")
    }
  }

  private def requireNumeric(norm: DataFrame, agg: AggFn): Unit = {
    // Normalization puts numeric values in vNum; a string-typed column has
    // vNum identically null, which would silently yield empty aggregates.
    // The check is structural (schema-level), not a data scan.
    require(
      norm.schema.fieldNames.contains("vNum"),
      s"${agg.name} requires a normalized input",
    )
  }

  /** The paper's join-aggregation query (Section III-B): left-join the train
    * table with the aggregated candidate, producing `[kY, y, x]`. Used by the
    * oracle tests and by full-join (non-sketched) MI estimation.
    */
  def augmentedJoin(train: DataFrame, trainKey: String, trainVal: String,
                    cand: DataFrame, candKey: String, candVal: String,
                    agg: AggFn): DataFrame = {
    val aug = aggregateNorm(Sketch.normalize(cand, candKey, candVal), agg)
      .select(
        col("k") as "kx",
        coalesce(col("vNum").cast("string"), col("vStr")) as "xs",
        col("vNum") as "xn",
        col("vStr") as "xstr",
      )
    train
      .select(train(trainKey).cast("string") as "ky", train(trainVal) as "y")
      .join(aug, col("ky") === col("kx"), "left")
      .select(col("ky"), col("y"), col("xn"), col("xstr"))
  }
}
