package repro.synth

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Hashing
import repro.stats.Rng

/** Synthetic stand-in for the paper's open-data table-pair collections
  * (Section V-C; WBF = World Bank Finances, NYC = NYC Open Data). The real
  * Socrata snapshots are unavailable offline, so we generate two-column
  * tables `[K: string, V]` whose joins exhibit the properties the evaluation
  * depends on: string join keys with Zipf-skewed frequencies, partial key
  * overlap, mixed string/numeric value columns, and a latent per-key score
  * that induces a wide spread of post-join dependence strengths (so ranking
  * sketch estimates against full-join estimates is meaningful).
  *
  * Collection profiles (see DESIGN.md §4): WBF-like is numeric-heavy with
  * larger joins and deeper key domains relative to the sketch size; NYC-like
  * is categorical-heavy with more skewed keys and smaller right-side domains.
  */
object OpenDataGen {

  /** One sampled table pair from a collection. */
  final case class PairSpec(
      collection: String,
      id: Int,
      seed: Long,
      leftRows: Int,
      leftKeyDomain: Int,
      rightKeyDomain: Int,
      rightDupMax: Int,     // max repeated rows per right key (exercises AGG)
      overlap: Double,      // fraction of right keys shared with the left domain
      alpha: Double,        // Zipf exponent of left key frequencies
      xNumeric: Boolean,
      yNumeric: Boolean,
      dep: Double,          // dependence strength via the shared latent score
  )

  final case class TablePair(spec: PairSpec, train: DataFrame, cand: DataFrame)

  def specs(collection: String, nPairs: Int, seed: Long): Seq[PairSpec] = {
    val rng = new Rng(seed)
    (0 until nPairs).map { id =>
      collection match {
        case "WBF" =>
          PairSpec(
            collection, id, seed = seed * 1000003L + id,
            leftRows      = 2000 + rng.nextInt(4000),
            leftKeyDomain = 400 + rng.nextInt(1600),
            rightKeyDomain = 500 + rng.nextInt(1500),
            rightDupMax   = 1 + rng.nextInt(3),
            overlap       = rng.uniform(0.3, 1.0),
            alpha         = rng.uniform(0.0, 0.8),
            xNumeric      = rng.nextDouble() < 0.8,
            yNumeric      = rng.nextDouble() < 0.8,
            dep           = rng.nextDouble(),
          )
        case "NYC" =>
          PairSpec(
            collection, id, seed = seed * 7000037L + id,
            leftRows      = 1000 + rng.nextInt(3000),
            leftKeyDomain = 800 + rng.nextInt(2200),
            rightKeyDomain = 100 + rng.nextInt(500),
            rightDupMax   = 1 + rng.nextInt(2),
            overlap       = rng.uniform(0.4, 1.0),
            alpha         = rng.uniform(0.4, 1.2),
            xNumeric      = rng.nextDouble() < 0.45,
            yNumeric      = rng.nextDouble() < 0.45,
            dep           = rng.nextDouble(),
          )
        case other => throw new IllegalArgumentException(s"unknown collection: $other")
      }
    }
  }

  /** Latent per-key score in [0, 1): deterministic in (pair seed, key id). */
  private def score(seed: Long, keyId: Int): Double =
    Hashing.fib(seed ^ (keyId.toLong * 0x5851F42D4C957F2DL + 0x14057B7EF767814FL))

  private def keyName(spec: PairSpec, keyId: Int): String = s"k${spec.id}_$keyId"

  /** A value from the latent score: with probability `dep` driven by the key
    * score, otherwise pure noise. Numeric values are continuous; string
    * values are one of ~12 category labels.
    */
  private def value(spec: PairSpec, rng: Rng, keyId: Int, numeric: Boolean,
                    side: Int): Any = {
    val s     = score(spec.seed + side, keyId)
    val drive = if (rng.nextDouble() < spec.dep) score(spec.seed + 99, keyId) else rng.nextDouble()
    if (numeric) 10.0 * drive + 0.05 * s + 0.01 * rng.nextGaussian()
    else s"c${math.min(11, (drive * 12).toInt)}"
  }

  /** Generate the (train, cand) DataFrames for a spec. */
  def generate(spark: SparkSession, spec: PairSpec): TablePair = {
    import spark.implicits._
    val rng = new Rng(spec.seed)
    val cdf = Rng.zipfCdf(spec.leftKeyDomain, spec.alpha)

    // Left/train table: Zipf-skewed keys over the left domain, target Y.
    val leftRows = (0 until spec.leftRows).map { _ =>
      val keyId = rng.zipf(cdf) - 1
      (keyName(spec, keyId), value(spec, rng, keyId, spec.yNumeric, side = 1))
    }

    // Right/cand table: distinct key ids, `overlap` of them from the left
    // domain and the rest disjoint; 1..dupMax rows per key, feature X.
    val nShared    = (spec.rightKeyDomain * spec.overlap).toInt
    val sharedIds  = Iterator.continually(rng.nextInt(spec.leftKeyDomain))
      .distinct.take(math.min(nShared, spec.leftKeyDomain)).toSeq
    val disjointIds = (0 until (spec.rightKeyDomain - sharedIds.size))
      .map(i => spec.leftKeyDomain + i)
    val rightRows = (sharedIds ++ disjointIds).flatMap { keyId =>
      val dups = 1 + rng.nextInt(spec.rightDupMax)
      (0 until dups).map(_ =>
        (keyName(spec, keyId), value(spec, rng, keyId, spec.xNumeric, side = 2)))
    }

    def toDf(rows: Seq[(String, Any)], vCol: String, numeric: Boolean): DataFrame =
      if (numeric) rows.map { case (k, v) => (k, v.asInstanceOf[Double]) }.toDF("k", vCol)
      else rows.map { case (k, v) => (k, v.asInstanceOf[String]) }.toDF("k", vCol)

    TablePair(
      spec,
      train = toDf(leftRows, "y", spec.yNumeric),
      cand  = toDf(rightRows, "x", spec.xNumeric),
    )
  }
}
