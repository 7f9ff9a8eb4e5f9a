package repro.core

import scala.collection.mutable.ArrayBuffer

/** Per-quantile few-k configuration (paper §4.2).
  *
  * For window size `N`, period `P` and quantile φ, the per-sub-window space
  * that *guarantees* the exact answer is the pool `poolSize = ⌈N(1-φ)⌉`
  * (the sub-window's largest values that could matter window-wide). A space
  * budget is expressed as a *fraction* of that pool, split into
  *
  *   - `topK(φ)`      — the k_t largest values cached for top-k merging
  *                       (statistical inefficiency), and
  *   - `sampleStep(φ)`— the interval i of sample-k merging over the pool
  *                       (bursty traffic); step 0 disables sampling.
  */
final case class FewKConfig(
    phis: Array[Double],
    poolSize: Array[Int],
    topK: Array[Int],
    sampleStep: Array[Int],
    burstAlpha: Double = 0.05,
) {
  require(phis.length == poolSize.length && phis.length == topK.length &&
    phis.length == sampleStep.length, "per-φ arrays must align")

  def topEnabled(i: Int): Boolean = topK(i) > 0
  def sampleEnabled(i: Int): Boolean = sampleStep(i) > 0
  def anyEnabled: Boolean = phis.indices.exists(i => topEnabled(i) || sampleEnabled(i))
}

object FewKConfig {

  /** All few-k machinery off — the plain §3 algorithm (Tables 1, 2, 5). */
  def disabled(phis: Array[Double]): FewKConfig =
    FewKConfig(phis, phis.map(_ => 0), phis.map(_ => 0), phis.map(_ => 0))

  /** Exact-guarantee per-sub-window pool: the window's φ-quantile is its
    * `t = N - ⌈φN⌉ + 1`-th largest element, so caching the t largest values
    * of every sub-window guarantees the exact answer even if all t sit in one
    * sub-window (N = 131072, φ = 0.999 → the paper's "132 largest entries").
    */
  private def pool(n: Long, phi: Double): Int =
    math.max(1, FewK.depthFromTop(n, phi).toInt)

  /** Top-k merging only, with per-sub-window cache `fraction × poolSize`
    * (Table 3). Applied to every φ with `P(1-φ) < ts` (the statistical-
    * inefficiency trigger); other φ keep the Level-2 estimate.
    */
  def topOnly(nWindow: Long, pPeriod: Long, phis: Array[Double],
              fraction: Double, ts: Double = 10.0): FewKConfig = {
    val pools = phis.map(pool(nWindow, _))
    val tops = phis.indices.map { i =>
      if (pPeriod * (1.0 - phis(i)) < ts)
        math.max(1, math.ceil(fraction * pools(i)).toInt)
      else 0
    }.toArray
    FewKConfig(phis, pools, tops, phis.map(_ => 0))
  }

  /** Sample-k merging only, with per-sub-window sample budget
    * `fraction × poolSize` (Table 4). `fraction <= 0` disables sampling.
    * Sampling is applied only to high quantiles (φ ≥ `minPhi`) — few-k
    * merging targets the tail; for non-high quantiles the exact-guarantee
    * pool would be a large fraction of the window.
    */
  def sampleOnly(nWindow: Long, phis: Array[Double], fraction: Double,
                 minPhi: Double = 0.99): FewKConfig = {
    val pools = phis.map(pool(nWindow, _))
    val steps = phis.indices.map { i =>
      if (fraction <= 0.0 || phis(i) < minPhi) 0
      else {
        val ks = math.max(1, math.ceil(fraction * pools(i)).toInt)
        math.max(1, math.round(pools(i).toDouble / ks).toInt)
      }
    }.toArray
    FewKConfig(phis, pools, phis.map(_ => 0), steps)
  }

  /** Paper's default budget split (§4.2 "Deciding k_t"): per sub-window
    * `k = fraction × poolSize`; `k_t = P(1-φ)` when the φ is statistically
    * inefficient (else 0); all the remaining budget goes to `k_s`.
    */
  def auto(nWindow: Long, pPeriod: Long, phis: Array[Double],
           fraction: Double, ts: Double = 10.0): FewKConfig = {
    val pools = phis.map(pool(nWindow, _))
    val tops = new Array[Int](phis.length)
    val steps = new Array[Int](phis.length)
    phis.indices.foreach { i =>
      val k = math.max(1, math.ceil(fraction * pools(i)).toInt)
      val inefficient = pPeriod * (1.0 - phis(i)) < ts
      val kt = if (inefficient) math.min(k, math.max(1, math.ceil(pPeriod * (1.0 - phis(i))).toInt)) else 0
      val ks = k - kt
      tops(i) = kt
      steps(i) = if (ks > 0) math.max(1, math.round(pools(i).toDouble / ks).toInt) else 0
    }
    FewKConfig(phis, pools, tops, steps)
  }
}

/** Merging of per-sub-window few-k caches into a window-level answer. */
object FewK {

  /** 1-based depth from the top for the φ-quantile of an N-element window:
    * the ⌈φN⌉-th smallest is the `N - ⌈φN⌉ + 1`-th largest.
    */
  def depthFromTop(nWindow: Long, phi: Double): Long =
    nWindow - Stat.rankOf(phi, nWindow) + 1

  /** Top-k merging (§4.2): concatenate every sub-window's k_t largest values,
    * and read the t-th largest of the merged bag. If fewer than t values were
    * cached (fraction too small / bursty sub-window), answer the smallest
    * cached value — this is exactly where accuracy degrades in Table 3.
    */
  def mergeTopK(caches: Iterable[Array[Double]], t: Long): Double = {
    val merged = new ArrayBuffer[Double]()
    caches.foreach(merged ++= _)
    require(merged.nonEmpty, "top-k merge with no cached values")
    val sorted = merged.toArray
    java.util.Arrays.sort(sorted)
    val idx = sorted.length - math.min(t, sorted.length.toLong).toInt
    sorted(idx)
  }

  /** Sample-k merging (§4.2): each sub-window contributes interval samples of
    * its pool, each standing for `weight = poolSize / sampleCount` ranked
    * values (the exact inverse of the paper's sampling fraction α — an
    * integer step would under-cover the pool and drop its deepest values).
    * The answer walks the merged samples in descending order accumulating
    * weight until the target depth t is covered (the paper's "refer to the
    * αN(1-φ)-th largest value to factor in data reduction by sampling").
    */
  def mergeSampleK(samples: Iterable[(Array[Double], Double)], t: Long): Double = {
    val weighted = new ArrayBuffer[(Double, Double)]()
    samples.foreach { case (vs, w) => vs.foreach(v => weighted += ((v, w))) }
    require(weighted.nonEmpty, "sample-k merge with no samples")
    val sorted = weighted.toArray.sortBy(-_._1)
    var cum = 0.0
    var i = 0
    while (i < sorted.length) {
      cum += sorted(i)._2
      if (cum >= t - 1e-9) return sorted(i)._1
      i += 1
    }
    sorted(sorted.length - 1)._1
  }

  /** The rank weight each of a sub-window's samples stands for. */
  def sampleWeight(poolLen: Int, sampleCount: Int): Double =
    if (sampleCount == 0) 0.0 else poolLen.toDouble / sampleCount

  /** Interval sampling of a descending pool: every `step`-th ranked value
    * (ranks step, 2·step, … — for i=2 "all even ranked values", §4.2).
    */
  def intervalSample(poolDescending: Array[Double], step: Int): Array[Double] = {
    require(step >= 1, s"step must be >= 1, got $step")
    val out = new ArrayBuffer[Double](poolDescending.length / step + 1)
    var r = step - 1
    while (r < poolDescending.length) { out += poolDescending(r); r += step }
    out.toArray
  }
}
