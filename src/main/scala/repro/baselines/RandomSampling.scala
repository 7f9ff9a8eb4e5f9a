package repro.baselines

import repro.core.{SlidingQuantilePolicy, Stat}
import scala.collection.mutable.ArrayDeque

/** Random — sampling-based sliding-window quantiles (Luo et al., VLDBJ'16;
  * paper §5.1 policy (4)).
  *
  * Each sub-window keeps a uniform reservoir sample; the window answer reads
  * the weighted rank over the merged samples of the `n` sealed sub-windows.
  * The total sample budget follows the classic
  * `S = (1/ε²)·ln(1/δ)` bound (with δ = 1e-8 this lands at ~45K variables for
  * ε = 0.02 — the magnitude Table 1 reports), split evenly across
  * sub-windows. Rank error is bounded by ε·N with probability ≥ 1-δ.
  */
final class RandomSampling(
    val windowSize: Long,
    val period: Long,
    val phis: Array[Double],
    val epsilon: Double,
    val delta: Double = 1e-8,
    seed: Long = 42L,
) extends SlidingQuantilePolicy {
  require(windowSize % period == 0, "window must be a multiple of period")

  private val nSub = (windowSize / period).toInt
  private val totalBudget = math.ceil(math.log(1.0 / delta) / (epsilon * epsilon)).toLong
  private val perSub = math.min(period, math.max(1L, totalBudget / nSub)).toInt
  private val rng = new java.util.Random(seed)

  /** Sealed sample with its weight = sub-window size / sample size. */
  private final case class Sample(values: Array[Double], weight: Double)

  private val sealed_ = new ArrayDeque[Sample](nSub + 1)
  private var reservoir = new Array[Double](perSub)
  private var seenInSub = 0L

  override def name: String = "Random"

  override def insert(v: Double): Unit = {
    if (seenInSub < perSub) reservoir(seenInSub.toInt) = v
    else {
      val j = (rng.nextDouble() * (seenInSub + 1)).toLong
      if (j < perSub) reservoir(j.toInt) = v
    }
    seenInSub += 1
    if (seenInSub == period) {
      val size = math.min(perSub.toLong, seenInSub).toInt
      val vals = java.util.Arrays.copyOf(reservoir, size)
      java.util.Arrays.sort(vals)
      sealed_.append(Sample(vals, seenInSub.toDouble / size))
      if (sealed_.length > nSub) sealed_.removeHead()
      reservoir = new Array[Double](perSub)
      seenInSub = 0
    }
  }

  override def evaluate(): Array[Double] = {
    require(sealed_.length == nSub, s"window not full: ${sealed_.length}/$nSub samples")
    // merge sorted samples with weights; answer weighted rank per φ
    val merged = new Array[(Double, Double)](sealed_.iterator.map(_.values.length).sum)
    var k = 0
    sealed_.foreach { s =>
      var i = 0
      while (i < s.values.length) { merged(k) = (s.values(i), s.weight); k += 1; i += 1 }
    }
    val sorted = merged.sortBy(_._1)
    phis.map { phi =>
      val target = Stat.rankOf(phi, windowSize).toDouble
      var cum = 0.0
      var i = 0
      var ans = sorted(sorted.length - 1)._1
      var done = false
      while (i < sorted.length && !done) {
        cum += sorted(i)._2
        if (cum >= target) { ans = sorted(i)._1; done = true }
        i += 1
      }
      ans
    }
  }

  override def observedSpace: Long =
    sealed_.iterator.map(_.values.length.toLong).sum + math.min(seenInSub, perSub.toLong)

  override def analyticalSpace: Long = totalBudget
}
