package repro.core

/** Exponential-family component distributions and their weighted MLEs
  * (Table I). Each similarity feature γ^(i) gets one distribution per group
  * (matched / unmatched); weights are the EM responsibilities l_j^<k>.
  */
object ExpFamily {

  /** Discretisation used when a feature is modelled as Multinomial. */
  val MultinomialBins = 10

  sealed trait Dist extends Serializable {
    def logPdf(x: Double): Double
  }

  /** Gaussian with variance floor for numerical safety. */
  final case class Gaussian(mu: Double, sigma2: Double) extends Dist {
    private val s2 = math.max(sigma2, 1e-8)
    def logPdf(x: Double): Double =
      -0.5 * math.log(2.0 * math.Pi * s2) - (x - mu) * (x - mu) / (2.0 * s2)
  }

  /** Exponential on [0, ∞); negative inputs are clamped to 0 (features are
    * non-negative by construction).
    *
    * λ is capped at 100: several γ features are zero-inflated, and an
    * unbounded MLE on an (almost) all-zero group diverges, turning the
    * log-odds into a step function "any x > 0 ⇒ ±∞" — one shared global
    * venue would then force a merge regardless of every other feature.
    */
  final case class Exponential(lambda: Double) extends Dist {
    val LambdaCap = 1e2
    private val l = math.min(math.max(lambda, 1e-8), LambdaCap)
    def logPdf(x: Double): Double = math.log(l) - l * math.max(x, 0.0)
  }

  /** Multinomial over [[MultinomialBins]] equal-width bins of [0, hi]. */
  final case class Multinomial(probs: Array[Double], hi: Double) extends Dist {
    def bin(x: Double): Int =
      math.min(((x / math.max(hi, 1e-12)) * probs.length).toInt, probs.length - 1).max(0)
    def logPdf(x: Double): Double = math.log(math.max(probs(bin(x)), 1e-12))
  }

  private def checkWeights(xs: Array[Double], w: Array[Double]): Unit =
    require(xs.length == w.length && xs.nonEmpty, "xs/w length mismatch or empty")

  /** Weighted Gaussian MLE: μ = Σwγ/Σw, σ² = Σw(γ-μ)²/Σw (Table I row 2). */
  def gaussianMle(xs: Array[Double], w: Array[Double]): Gaussian = {
    checkWeights(xs, w)
    val sw = w.sum
    if (sw <= 0.0) return Gaussian(0.0, 1.0)
    var mu = 0.0; var i = 0
    while (i < xs.length) { mu += w(i) * xs(i); i += 1 }
    mu /= sw
    var s2 = 0.0; i = 0
    while (i < xs.length) { val d = xs(i) - mu; s2 += w(i) * d * d; i += 1 }
    Gaussian(mu, math.max(s2 / sw, 1e-8))
  }

  /** Weighted Exponential MLE: λ = Σw / Σwγ (Table I row 3). */
  def exponentialMle(xs: Array[Double], w: Array[Double]): Exponential = {
    checkWeights(xs, w)
    val sw = w.sum
    if (sw <= 0.0) return Exponential(1.0)
    var sx = 0.0; var i = 0
    while (i < xs.length) { sx += w(i) * math.max(xs(i), 0.0); i += 1 }
    Exponential(if (sx <= 1e-12) 1e2 else sw / sx)
  }

  /** Weighted Multinomial MLE: p_h = Σw·I[γ=h] / Σw with Laplace smoothing
    * (Table I row 1). `hi` fixes the binning range for train/score parity.
    */
  def multinomialMle(xs: Array[Double], w: Array[Double], hi: Double): Multinomial = {
    checkWeights(xs, w)
    val tmp = Multinomial(Array.fill(MultinomialBins)(1.0 / MultinomialBins), hi)
    val counts = new Array[Double](MultinomialBins)
    var i = 0
    while (i < xs.length) { counts(tmp.bin(xs(i))) += w(i); i += 1 }
    val sw = counts.sum
    val smoothed = counts.map(c => (c + 1e-3) / (sw + 1e-3 * MultinomialBins))
    Multinomial(smoothed, hi)
  }

  /** Fit the distribution named by `kind` ("gaussian" | "exponential" |
    * "multinomial") with weights `w`.
    */
  def fit(kind: String, xs: Array[Double], w: Array[Double], hi: Double): Dist = kind match {
    case "gaussian"    => gaussianMle(xs, w)
    case "exponential" => exponentialMle(xs, w)
    case "multinomial" => multinomialMle(xs, w, hi)
    case other         => throw new IllegalArgumentException(s"unknown distribution kind: $other")
  }
}
