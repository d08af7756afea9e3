package repro

import repro.mi.{EstimatorKind, MI, NumCol}
import repro.sketch.{AggFn, Sketch, TupSk}
import repro.stats.Rng
import repro.synth.{CDUnif, Decompose}

/** End-to-end smoke: generate CDUnif, decompose, sketch with TUPSK (UDAF
  * path), join, estimate — the whole pipeline in one test.
  */
class SmokeSpec extends SparkSpec {

  test("TUPSK end-to-end on CDUnif recovers a usable MI estimate") {
    val rng      = new Rng(1)
    val m        = 50
    val (xi, yd) = CDUnif.sample(rng, m, 5000)
    val pair     = Decompose(spark, xi.map(_.toDouble), yd, Decompose.KeyInd)
    val conf     = Sketch.SketchConf(256)
    val left     = TupSk.sketchLeft(pair.train, "k", "y", conf)
    val right    = TupSk.sketchRight(pair.cand, "k", "x", AggFn.First, conf)
    assert(left.count() == 256)
    assert(right.count() == 256)
    val sample = Sketch.collectSample(Sketch.join(left, right))
    assert(sample.size == 256, s"expected full coordination, got ${sample.size}")
    val est   = MI.estimate(EstimatorKind.MixedKSG, sample.x, sample.y)
    val truth = CDUnif.trueMI(m)
    assert(math.abs(est - truth) < 1.2, s"est=$est truth=$truth")
    assert(sample.x.isInstanceOf[NumCol] && sample.y.isInstanceOf[NumCol])
  }
}
