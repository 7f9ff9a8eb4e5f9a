package repro.core

/** One-sided Mann–Whitney U test (paper §4.3, citing Mann & Whitney 1947).
  *
  * QLOVE detects bursty traffic by testing whether the sampled largest values
  * of the *current* sub-window are stochastically larger than those of the
  * adjacent former sub-window. We use the normal approximation with midranks
  * for ties and a tie-corrected variance (standard for n ≥ ~8; few-k sample
  * sizes are in the tens to hundreds).
  */
object MannWhitney {

  /** p-value of the one-sided alternative "x is stochastically larger than y".
    * Returns 1.0 when either sample is too small to test (< 3 points).
    */
  def pValueGreater(x: Array[Double], y: Array[Double]): Double = {
    val nx = x.length.toLong
    val ny = y.length.toLong
    if (nx < 3 || ny < 3) return 1.0
    val all = new Array[(Double, Int)]((nx + ny).toInt)
    var i = 0
    while (i < nx) { all(i) = (x(i), 0); i += 1 }
    var j = 0
    while (j < ny) { all(i + j) = (y(j), 1); j += 1 }
    val sorted = all.sortBy(_._1)
    // midranks + tie counts
    var rankSumX = 0.0
    var tieCorrection = 0.0
    var k = 0
    while (k < sorted.length) {
      var e = k
      while (e + 1 < sorted.length && sorted(e + 1)._1 == sorted(k)._1) e += 1
      val t = (e - k + 1).toDouble
      val midrank = (k + 1 + e + 1) / 2.0
      var m = k
      while (m <= e) { if (sorted(m)._2 == 0) rankSumX += midrank; m += 1 }
      tieCorrection += t * t * t - t
      k = e + 1
    }
    val u = rankSumX - nx * (nx + 1) / 2.0
    val n = (nx + ny).toDouble
    val meanU = nx * ny / 2.0
    val varU = nx * ny / 12.0 * ((n + 1) - tieCorrection / (n * (n - 1)))
    if (varU <= 0) return 1.0 // all values identical
    val z = (u - meanU - 0.5) / math.sqrt(varU) // continuity correction
    1.0 - Stat.normalCdf(z)
  }

  /** Convenience: burst decision at significance level `alpha`. */
  def isStochasticallyLarger(x: Array[Double], y: Array[Double], alpha: Double = 0.05): Boolean =
    pValueGreater(x, y) < alpha
}
