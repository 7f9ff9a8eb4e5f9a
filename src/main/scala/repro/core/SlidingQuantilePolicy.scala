package repro.core

/** The incremental-evaluation contract every policy implements (paper §2).
  *
  * The harness feeds one element per `insert` and calls `evaluate` once per
  * window period (only after a full window has been observed), mirroring a
  * Trill-style streaming engine: `insert` is Accumulate (policies handle
  * their own sub-window sealing / deaccumulation internally) and `evaluate`
  * is ComputeResult over the current window.
  */
trait SlidingQuantilePolicy {

  /** Display name used in table rows. */
  def name: String

  /** The quantiles this policy answers, in the order `evaluate` returns them. */
  def phis: Array[Double]

  /** Accumulate one streamed value. */
  def insert(v: Double): Unit

  /** Approximate quantile per φ for the current window. Called only when at
    * least one full window has been inserted, immediately after the
    * period-boundary insert.
    */
  def evaluate(): Array[Double]

  /** Current "number of variables" held in memory (paper's space metric). */
  def observedSpace: Long

  /** Closed-form space bound, or -1 when the paper reports none. */
  def analyticalSpace: Long = -1L
}
