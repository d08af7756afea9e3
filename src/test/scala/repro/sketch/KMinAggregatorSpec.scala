package repro.sketch

import org.scalacheck.{Gen, Prop, Test => SCTest}
import repro.SparkSpec
import repro.sketch.Sketch.TopNImpl

class KMinAggregatorSpec extends SparkSpec {

  /** Run a ScalaCheck property and fail the ScalaTest test on falsification. */
  private def check(prop: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), prop)
    assert(res.passed, res.status.toString)
  }

  private def row(hkey: Long, hu: Double): SketchRow =
    SketchRow(hkey, hu, Some(hkey.toDouble), None)

  private val genRows: Gen[List[SketchRow]] =
    Gen.listOf(for {
      hk <- Gen.chooseNum(Long.MinValue, Long.MaxValue)
      hu <- Gen.chooseNum(0.0, 1.0)
    } yield row(hk, hu))

  test("driver-level: reduce+finish keeps exactly the n smallest by (hu, hkey)") {
    check(Prop.forAll(genRows, Gen.chooseNum(1, 16)) { (rows, n) =>
      val agg    = new KMinAggregator(n)
      val got    = rows.foldLeft(agg.zero)(agg.reduce)
      val result = agg.finish(got).rows
      val expect = rows.sortBy(r => (r.hu, r.hkey)).take(n)
      result == expect
    })
  }

  test("driver-level: merge of split streams equals single-stream result") {
    check(Prop.forAll(genRows, genRows, Gen.chooseNum(1, 8)) { (a, b, n) =>
      val agg    = new KMinAggregator(n)
      val merged = agg.finish(agg.merge(a.foldLeft(agg.zero)(agg.reduce),
                                        b.foldLeft(agg.zero)(agg.reduce))).rows
      val single = agg.finish((a ++ b).foldLeft(agg.zero)(agg.reduce)).rows
      merged == single
    })
  }

  test("driver-level: buffer never exceeds 2n entries mid-stream") {
    val n   = 4
    val agg = new KMinAggregator(n)
    var buf = agg.zero
    val rnd = new java.util.Random(1)
    (0 until 1000).foreach { i =>
      buf = agg.reduce(buf, row(i.toLong, rnd.nextDouble()))
      assert(buf.rows.size <= 2 * n)
    }
  }

  test("zero buffer finishes empty") {
    val agg = new KMinAggregator(5)
    assert(agg.finish(agg.zero).rows.isEmpty)
  }

  test("rejects non-positive n") {
    intercept[IllegalArgumentException](new KMinAggregator(0))
  }

  test("Spark: UDAF path equals sortLimit path on skewed data") {
    import org.apache.spark.sql.functions._
    import repro.core.Hashing
    val df = repro.SynthData.zipfKeys(spark, rows = 20000, nKeys = 500, seed = 7)
    val pre = df.select(
      Hashing.hkey(col("k")) as "hkey",
      Hashing.huKey(Hashing.SaltKey, concat(col("k"), lit("_"), col("v"))) as "hu",
      col("v") as "vNum",
      lit(null).cast("string") as "vStr",
    ).repartition(13) // force multi-partition merges
    for (n <- Seq(1, 7, 256, 1024)) {
      val udaf = Sketch.topN(pre, n, TopNImpl.Udaf).orderBy("hu", "hkey").collect().toSeq
      val sort = Sketch.topN(pre, n, TopNImpl.SortLimit).orderBy("hu", "hkey").collect().toSeq
      assert(udaf == sort, s"n=$n")
      assert(udaf.size == n)
    }
  }

  test("Spark: UDAF returns all rows when n exceeds input size") {
    import org.apache.spark.sql.functions._
    import repro.core.Hashing
    import spark.implicits._
    val pre = Seq(("a", 1.0), ("b", 2.0)).toDF("k", "v").select(
      Hashing.hkey(col("k")) as "hkey",
      Hashing.huKey(Hashing.SaltKey, col("k")) as "hu",
      col("v") as "vNum",
      lit(null).cast("string") as "vStr",
    )
    assert(Sketch.topN(pre, 100, TopNImpl.Udaf).count() == 2)
  }
}
