package repro.core

/** Small numeric/statistics toolbox shared by generators, the Mann–Whitney
  * burst detector and the moment-sketch baseline.
  *
  * Everything here is deterministic and allocation-free so it can run both on
  * the driver (per-element streaming harness) and inside Spark expressions.
  */
object Stat {

  /** SplitMix64 finalizer — maps (seed, index) to a well-mixed 64-bit hash.
    * Used to derive i.i.d. uniforms addressable by element index, so the same
    * dataset can be generated sequentially on the driver and in parallel in
    * Spark with bit-identical results.
    */
  def mix64(seed: Long, i: Long): Long = {
    var z = seed + 0x9E3779B97F4A7C15L * (i + 1)
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Uniform draw in the open interval (0, 1), keyed by (seed, index). */
  def uniform(seed: Long, i: Long): Double = {
    val bits = mix64(seed, i) >>> 11 // 53 significant bits
    (bits + 0.5) / (1L << 53).toDouble
  }

  /** Standard normal CDF Φ(x) via the Abramowitz–Stegun 7.1.26 erf
    * approximation (|error| < 1.5e-7 — plenty for p-values and generators).
    */
  def normalCdf(x: Double): Double = {
    val t = 1.0 / (1.0 + 0.2316419 * math.abs(x))
    val poly = t * (0.319381530 + t * (-0.356563782 + t * (1.781477937 +
      t * (-1.821255978 + t * 1.330274429))))
    val nd = math.exp(-0.5 * x * x) / math.sqrt(2.0 * math.Pi)
    val p = 1.0 - nd * poly
    if (x >= 0) p else 1.0 - p
  }

  /** Inverse standard normal CDF Φ⁻¹(p) — Acklam's rational approximation
    * (relative error < 1.15e-9 over (0,1)).
    */
  def inverseNormalCdf(p: Double): Double = {
    require(p > 0.0 && p < 1.0, s"p must be in (0,1), got $p")
    val a = Array(-3.969683028665376e+01, 2.209460984245205e+02,
      -2.759285104469687e+02, 1.383577518672690e+02,
      -3.066479806614716e+01, 2.506628277459239e+00)
    val b = Array(-5.447609879822406e+01, 1.615858368580409e+02,
      -1.556989798598866e+02, 6.680131188771972e+01, -1.328068155288572e+01)
    val c = Array(-7.784894002430293e-03, -3.223964580411365e-01,
      -2.400758277161838e+00, -2.549732539343734e+00,
      4.374664141464968e+00, 2.938163982698783e+00)
    val d = Array(7.784695709041462e-03, 3.224671290700398e-01,
      2.445134137142996e+00, 3.754408661907416e+00)
    val pLow = 0.02425
    if (p < pLow) {
      val q = math.sqrt(-2.0 * math.log(p))
      (((((c(0) * q + c(1)) * q + c(2)) * q + c(3)) * q + c(4)) * q + c(5)) /
        ((((d(0) * q + d(1)) * q + d(2)) * q + d(3)) * q + 1.0)
    } else if (p <= 1.0 - pLow) {
      val q = p - 0.5
      val r = q * q
      (((((a(0) * r + a(1)) * r + a(2)) * r + a(3)) * r + a(4)) * r + a(5)) * q /
        (((((b(0) * r + b(1)) * r + b(2)) * r + b(3)) * r + b(4)) * r + 1.0)
    } else {
      val q = math.sqrt(-2.0 * math.log(1.0 - p))
      -(((((c(0) * q + c(1)) * q + c(2)) * q + c(3)) * q + c(4)) * q + c(5)) /
        ((((d(0) * q + d(1)) * q + d(2)) * q + d(3)) * q + 1.0)
    }
  }

  /** Rank `r = ⌈φ·count⌉` of the φ-quantile per paper Algorithm 1 (1-based,
    * clamped to at least 1 so φ→0 degenerates to the minimum). The small
    * epsilon guards against fp noise pushing an exact product past its
    * ceiling (0.99 × 400 = 396.0000000000001 must stay rank 396).
    */
  def rankOf(phi: Double, count: Long): Long =
    math.max(1L, math.ceil(phi * count - 1e-9).toLong)

  /** Exact φ-quantile of an (unsorted) array, by the paper's ⌈φN⌉ rank rule. */
  def exactQuantile(values: Array[Double], phi: Double): Double = {
    require(values.nonEmpty, "quantile of empty data")
    val sorted = values.sorted
    sorted((rankOf(phi, sorted.length) - 1).toInt)
  }
}
