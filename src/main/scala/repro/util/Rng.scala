package repro.util

/** Deterministic, allocation-free hash RNG helpers.
  *
  * All synthetic-data decisions are keyed on (seed, entity ids) through
  * splitmix64 so that generators are reproducible regardless of Spark
  * partitioning or evaluation order. Never use `scala.util.Random` state
  * inside a distributed closure — partition scheduling would make runs
  * non-deterministic.
  */
object Rng {

  /** splitmix64 finalizer: a high-quality 64-bit mixer. */
  def mix64(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Combine an arbitrary number of longs into one mixed hash. */
  def mix(parts: Long*): Long = {
    var h = 0x632be59bd9b4e019L
    parts.foreach(p => h = mix64(h ^ p))
    h
  }

  /** Uniform double in [0, 1) from a mixed hash. */
  def uniform(parts: Long*): Double =
    ((mix(parts: _*) >>> 11).toDouble) / (1L << 53).toDouble

  /** Uniform int in [0, n) from a mixed hash. */
  def uniformInt(n: Int, parts: Long*): Int = {
    require(n > 0, s"uniformInt needs n > 0, got $n")
    (uniform(parts: _*) * n).toInt.min(n - 1)
  }

  /** Standard normal via Box–Muller on two derived uniforms. */
  def gaussian(parts: Long*): Double = {
    val u1 = math.max(uniform(parts :+ 1L: _*), 1e-12)
    val u2 = uniform(parts :+ 2L: _*)
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Zipf-distributed rank in [0, n): P(k) ∝ 1/(k+1)^alpha, via inverse CDF
    * over precomputed weights. Deterministic in (parts, n, alpha).
    */
  def zipf(n: Int, alpha: Double, parts: Long*): Int = {
    require(n > 0)
    val u = uniform(parts: _*)
    // Closed-form approximate inverse CDF for the continuous zipf envelope.
    if (math.abs(alpha - 1.0) < 1e-9) {
      val k = math.pow(n.toDouble, u) - 1.0
      k.toInt.max(0).min(n - 1)
    } else {
      val a = 1.0 - alpha
      val k = math.pow(u * (math.pow(n.toDouble, a) - 1.0) + 1.0, 1.0 / a) - 1.0
      k.toInt.max(0).min(n - 1)
    }
  }
}
