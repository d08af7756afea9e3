package repro.mi

import org.scalatest.funsuite.AnyFunSuite
import repro.stats.Rng
import repro.synth.CDUnif

class MixedKsgSpec extends AnyFunSuite {

  test("MixedKSG on independent continuous variables is ~0") {
    val rng = new Rng(1)
    val xs  = Array.fill(2000)(rng.nextDouble())
    val ys  = Array.fill(2000)(rng.nextDouble())
    assert(MixedKsg.mi(xs, ys) < 0.05)
  }

  test("MixedKSG on independent discrete variables is ~0") {
    val rng = new Rng(2)
    val xs  = Array.fill(3000)(rng.nextInt(5).toDouble)
    val ys  = Array.fill(3000)(rng.nextInt(5).toDouble)
    assert(MixedKsg.mi(xs, ys) < 0.05)
  }

  test("MixedKSG recovers CDUnif analytic MI (the Gao et al. benchmark)") {
    for (m <- Seq(3, 10)) {
      val (xi, yd) = CDUnif.sample(new Rng(3), m, 4000)
      val est      = MixedKsg.mi(xi.map(_.toDouble), yd)
      val truth    = CDUnif.trueMI(m)
      assert(math.abs(est - truth) < 0.12, s"m=$m est=$est truth=$truth")
    }
  }

  test("MixedKSG approximates the plug-in MI on purely discrete data") {
    // Gao et al.: the estimator recovers the plug-in estimator inside
    // discrete regions of the distribution.
    val rng = new Rng(4)
    val n   = 4000
    val xs  = new Array[Double](n); val ys = new Array[Double](n)
    (0 until n).foreach { i =>
      val u = rng.nextDouble()
      val (x, y) = if (u < 0.4) (0, 0) else if (u < 0.8) (1, 1) else if (u < 0.9) (0, 1) else (1, 0)
      xs(i) = x; ys(i) = y
    }
    val plugin = Mle.mi(xs.map(Double.box(_): AnyRef).toIndexedSeq,
                        ys.map(Double.box(_): AnyRef).toIndexedSeq)
    val mixed  = MixedKsg.mi(xs, ys)
    assert(math.abs(mixed - plugin) < 0.1, s"mixed=$mixed plugin=$plugin")
  }

  test("MixedKSG on a correlated Gaussian tracks KSG") {
    val rng = new Rng(5)
    val n   = 2500; val r = 0.8
    val xs  = new Array[Double](n); val ys = new Array[Double](n)
    (0 until n).foreach { i =>
      val z1 = rng.nextGaussian(); val z2 = rng.nextGaussian()
      xs(i) = z1; ys(i) = r * z1 + math.sqrt(1 - r * r) * z2
    }
    val truth = -0.5 * math.log(1 - r * r)
    assert(math.abs(MixedKsg.mi(xs, ys) - truth) < 0.12)
  }

  test("MixedKSG handles mixtures with repeated values (left-join shape)") {
    // y repeats per discrete x (as created by joins on repeated keys); the
    // estimate must be finite and positive for dependent data.
    val rng = new Rng(6)
    val n   = 2000
    val xs  = Array.fill(n)(rng.nextInt(20).toDouble)
    val ys  = xs.map(x => x / 2.0) // deterministic function, many ties
    val est = MixedKsg.mi(xs, ys)
    assert(!est.isNaN && !est.isInfinite && est > 1.5, s"est=$est")
  }

  test("MixedKSG never returns a negative estimate") {
    val rng = new Rng(7)
    val xs  = Array.fill(500)(rng.nextInt(3).toDouble)
    val ys  = Array.fill(500)(rng.nextGaussian())
    assert(MixedKsg.mi(xs, ys) >= 0.0)
  }

  test("MixedKSG rejects tiny samples") {
    intercept[IllegalArgumentException](MixedKsg.mi(Array(1.0), Array(1.0)))
  }
}
