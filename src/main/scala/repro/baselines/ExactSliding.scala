package repro.baselines

import repro.core.{FreqSketch, SlidingQuantilePolicy}
import scala.collection.mutable.ArrayDeque

/** Exact sliding-window quantiles (paper §5.1, policy (1)).
  *
  * Extends Algorithm 1 with deaccumulation: the window's values live in a
  * frequency red-black tree; on expiry the expired value's node decrements
  * its frequency and is deleted when it reaches zero. A ring buffer preserves
  * arrival order so the oldest element is known at expiry time.
  */
final class ExactSliding(
    val windowSize: Long,
    val phis: Array[Double],
) extends SlidingQuantilePolicy {
  private val tree = new FreqSketch
  private val ring = new ArrayDeque[Double]((windowSize + 1).toInt)

  override def name: String = "Exact"

  override def insert(v: Double): Unit = {
    tree.accumulate(v)
    ring.append(v)
    if (ring.length > windowSize) tree.deaccumulate(ring.removeHead())
  }

  override def evaluate(): Array[Double] = {
    require(tree.count == windowSize, s"window not full: ${tree.count}/$windowSize")
    tree.computeResult(phis)
  }

  /** Exact rank interval of `v` within the current window (ground-truth
    * helper for measuring competitors' rank errors).
    */
  def rankInterval(v: Double): (Long, Long) = tree.rankInterval(v)

  override def observedSpace: Long = tree.observedSpace + ring.length

  override def analyticalSpace: Long = 3L * windowSize // value ring + {value,count} nodes
}
