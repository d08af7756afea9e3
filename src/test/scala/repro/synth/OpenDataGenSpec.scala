package repro.synth

import org.apache.spark.sql.types.{DoubleType, StringType}
import repro.SparkSpec

class OpenDataGenSpec extends SparkSpec {

  test("specs are deterministic in the seed") {
    val a = OpenDataGen.specs("NYC", 20, 1)
    val b = OpenDataGen.specs("NYC", 20, 1)
    assert(a == b)
    assert(a != OpenDataGen.specs("NYC", 20, 2))
  }

  test("collection profiles differ: WBF is numeric-heavy, NYC categorical-heavy") {
    val wbf = OpenDataGen.specs("WBF", 300, 3)
    val nyc = OpenDataGen.specs("NYC", 300, 3)
    assert(wbf.count(_.xNumeric) > nyc.count(_.xNumeric))
    assert(wbf.count(_.yNumeric) > nyc.count(_.yNumeric))
  }

  test("unknown collections are rejected") {
    intercept[IllegalArgumentException](OpenDataGen.specs("XXX", 1, 1))
  }

  test("generated tables have the declared schema types") {
    val spec = OpenDataGen.specs("WBF", 5, 4).head
    val pair = OpenDataGen.generate(spark, spec)
    assert(pair.train.schema("k").dataType == StringType)
    assert(pair.cand.schema("k").dataType == StringType)
    assert(pair.train.schema("y").dataType == (if (spec.yNumeric) DoubleType else StringType))
    assert(pair.cand.schema("x").dataType == (if (spec.xNumeric) DoubleType else StringType))
  }

  test("left table has the declared row count; right respects dup bounds") {
    val spec = OpenDataGen.specs("NYC", 3, 5).head
    val pair = OpenDataGen.generate(spark, spec)
    assert(pair.train.count() == spec.leftRows)
    val perKey = pair.cand.groupBy("k").count().collect().map(_.getLong(1))
    assert(perKey.forall(c => c >= 1 && c <= spec.rightDupMax))
  }

  test("right key domain size matches the spec") {
    val spec = OpenDataGen.specs("WBF", 3, 6).head
    val pair = OpenDataGen.generate(spark, spec)
    assert(pair.cand.select("k").distinct().count() == spec.rightKeyDomain)
  }

  test("key overlap tracks the overlap parameter") {
    val spec = OpenDataGen.specs("NYC", 10, 7).head
    val pair = OpenDataGen.generate(spark, spec)
    val leftKeys  = pair.train.select("k").distinct().collect().map(_.getString(0)).toSet
    val rightKeys = pair.cand.select("k").distinct().collect().map(_.getString(0)).toSet
    val shared    = rightKeys.count(leftKeys.contains)
    // The generator draws `overlap` of the right keys from the left *domain*;
    // the left table samples that domain, so realized overlap is <= nominal.
    assert(shared <= (spec.rightKeyDomain * spec.overlap).toInt + 1)
    assert(shared > 0)
  }

  test("strong-dependence pairs yield higher full-join MI than weak ones") {
    import org.apache.spark.sql.functions._
    val specs  = OpenDataGen.specs("WBF", 40, 8)
    val strong = specs.filter(s => s.dep > 0.9 && s.xNumeric && s.yNumeric)
      .take(2)
    val weak   = specs.filter(s => s.dep < 0.1 && s.xNumeric && s.yNumeric)
      .take(2)
    assume(strong.nonEmpty && weak.nonEmpty)
    def fullMi(spec: OpenDataGen.PairSpec): Double = {
      val pair   = OpenDataGen.generate(spark, spec)
      val joined = repro.sketch.Featurize
        .augmentedJoin(pair.train, "k", "y", pair.cand, "k", "x", repro.sketch.AggFn.Avg)
        .filter(col("xn").isNotNull)
        .select("xn", "y").collect()
      val xs = joined.map(_.getDouble(0)); val ys = joined.map(_.getDouble(1))
      if (xs.length < 10) Double.NaN
      else repro.mi.MixedKsg.mi(xs.take(3000), ys.take(3000))
    }
    val sMi = strong.map(fullMi).filter(!_.isNaN)
    val wMi = weak.map(fullMi).filter(!_.isNaN)
    assume(sMi.nonEmpty && wMi.nonEmpty)
    assert(sMi.max > wMi.min, s"strong=$sMi weak=$wMi")
  }

  test("table generation is deterministic") {
    val spec = OpenDataGen.specs("NYC", 1, 9).head
    val a = OpenDataGen.generate(spark, spec).train.collect().map(_.toString).sorted.toSeq
    val b = OpenDataGen.generate(spark, spec).train.collect().map(_.toString).sorted.toSeq
    assert(a == b)
  }
}
