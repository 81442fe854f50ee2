package repro.core

import org.scalacheck.Gen
import repro.{PropChecks, SparkSpec}
import ExpFamily._

class ExpFamilySpec extends SparkSpec with PropChecks {

  private val xsGen: Gen[Array[Double]] =
    Gen.choose(3, 40).flatMap(n => Gen.listOfN(n, Gen.choose(0.01, 5.0)).map(_.toArray))

  test("Gaussian MLE with unit weights recovers mean and variance") {
    val xs = Array(1.0, 2.0, 3.0, 4.0)
    val g = gaussianMle(xs, Array.fill(4)(1.0))
    assert(math.abs(g.mu - 2.5) < 1e-12)
    assert(math.abs(g.sigma2 - 1.25) < 1e-12)
  }

  test("Gaussian MLE respects weights (Table I row 2)") {
    val xs = Array(0.0, 10.0)
    val g = gaussianMle(xs, Array(3.0, 1.0))
    assert(math.abs(g.mu - 2.5) < 1e-12) // (3*0 + 1*10)/4
  }

  test("Gaussian MLE with zero total weight degrades gracefully") {
    val g = gaussianMle(Array(1.0, 2.0), Array(0.0, 0.0))
    assert(g.sigma2 > 0.0)
  }

  test("Exponential MLE: lambda = sum(w)/sum(w*x) (Table I row 3)") {
    val e = exponentialMle(Array(1.0, 3.0), Array(1.0, 1.0))
    assert(math.abs(e.lambda - 0.5) < 1e-12)
  }

  test("Exponential MLE caps divergent lambda when all mass is at zero") {
    val e = exponentialMle(Array(0.0, 0.0), Array(1.0, 1.0))
    assert(e.lambda === 1e2) // capped, not divergent — see Exponential doc
    assert(!e.logPdf(0.0).isNaN)
    // The cap bounds the per-feature log-odds step at x -> 0+.
    assert(math.abs(Exponential(1e9).logPdf(0.0) - math.log(1e2)) < 1e-9)
  }

  test("Multinomial MLE: weighted bin frequencies with smoothing (Table I row 1)") {
    val xs = Array(0.05, 0.05, 0.95)
    val m = multinomialMle(xs, Array(1.0, 1.0, 2.0), hi = 1.0)
    val lowBin = m.bin(0.05); val hiBin = m.bin(0.95)
    assert(m.probs(lowBin) > m.probs(hiBin) * 0.9)
    assert(math.abs(m.probs.sum - 1.0) < 1e-6)
  }

  test("Multinomial bins clamp out-of-range values") {
    val m = multinomialMle(Array(0.5), Array(1.0), hi = 1.0)
    assert(m.bin(-1.0) === 0)
    assert(m.bin(99.0) === MultinomialBins - 1)
  }

  test("property: Gaussian MLE maximises likelihood vs perturbed params") {
    forAll(xsGen, samples = 20) { xs =>
      val w = Array.fill(xs.length)(1.0)
      val fit = gaussianMle(xs, w)
      def ll(d: Dist) = xs.map(d.logPdf).sum
      val base = ll(fit)
      for (dm <- Seq(-0.1, 0.1); ds <- Seq(0.9, 1.1)) {
        val pert = Gaussian(fit.mu + dm, fit.sigma2 * ds)
        assert(ll(pert) <= base + 1e-9, s"perturbed beat MLE on ${xs.take(3).mkString(",")}")
      }
    }
  }

  test("property: Exponential MLE maximises likelihood vs perturbed lambda") {
    forAll(xsGen, samples = 20) { xs =>
      val w = Array.fill(xs.length)(1.0)
      val fit = exponentialMle(xs, w)
      def ll(d: Dist) = xs.map(d.logPdf).sum
      val base = ll(fit)
      for (f <- Seq(0.8, 0.95, 1.05, 1.2)) {
        assert(ll(Exponential(fit.lambda * f)) <= base + 1e-9)
      }
    }
  }

  test("logPdf values are finite for all three families") {
    val ds: Seq[Dist] = Seq(
      Gaussian(0.5, 0.01),
      Exponential(3.0),
      multinomialMle(Array(0.1, 0.9), Array(1.0, 1.0), 1.0),
    )
    for (d <- ds; x <- Seq(0.0, 0.5, 1.0, 7.0)) {
      val v = d.logPdf(x)
      assert(!v.isNaN && !v.isInfinite, s"$d logPdf($x) = $v")
    }
  }

  test("fit dispatches by kind and rejects unknown kinds") {
    val xs = Array(0.2, 0.4); val w = Array(1.0, 1.0)
    assert(fit("gaussian", xs, w, 1.0).isInstanceOf[Gaussian])
    assert(fit("exponential", xs, w, 1.0).isInstanceOf[Exponential])
    assert(fit("multinomial", xs, w, 1.0).isInstanceOf[Multinomial])
    intercept[IllegalArgumentException] { fit("poisson", xs, w, 1.0) }
  }

  test("MLE rejects mismatched or empty inputs") {
    intercept[IllegalArgumentException] { gaussianMle(Array(1.0), Array(1.0, 2.0)) }
    intercept[IllegalArgumentException] { exponentialMle(Array.empty, Array.empty) }
  }
}
