package repro.harness

import repro.baselines.ExactSliding
import repro.core.{SlidingQuantilePolicy, Stat}
import scala.collection.mutable.ArrayBuffer

/** Streaming-engine substrate: drives policies element-by-element with the
  * paper's windowing semantics (window size N, period P, evaluate on every
  * period boundary once a full window exists) and measures the paper's three
  * metrics against an exact ground truth maintained alongside:
  *
  *   - average relative value error  (1/n)·Σ |a_i - b_i| / b_i  (in %),
  *   - average relative rank error   e' = (1/n)·Σ |r - r'_i| / N,
  *   - observed space ("number of variables"), averaged over evaluations.
  */
object SlidingEval {

  /** Per-φ aggregate over all window evaluations of one policy. */
  final case class PolicyResult(
      policy: String,
      phis: Array[Double],
      valueErrorPct: Array[Double],
      rankError: Array[Double],
      observedSpace: Long,
      analyticalSpace: Long,
      evaluations: Int,
      estimates: Array[Array[Double]], // [evaluation][φ]
      exacts: Array[Array[Double]],    // [evaluation][φ]
  )

  /** Run `policies` over `data` under an (N, P) sliding window. All policies
    * see the identical element sequence; the ground truth is an [[ExactSliding]]
    * over the raw (unquantized) values.
    */
  def run(data: Array[Double], windowSize: Long, period: Long,
          phis: Array[Double], policies: Seq[SlidingQuantilePolicy]): Seq[PolicyResult] = {
    require(windowSize % period == 0, "window must be a multiple of period")
    require(data.length >= windowSize, s"need at least $windowSize elements, got ${data.length}")
    val truth = new ExactSliding(windowSize, phis)
    val sumAbsRel = Array.ofDim[Double](policies.length, phis.length)
    val sumRankErr = Array.ofDim[Double](policies.length, phis.length)
    val sumSpace = new Array[Long](policies.length)
    val estimates = policies.map(_ => new ArrayBuffer[Array[Double]]()).toArray
    val exacts = new ArrayBuffer[Array[Double]]()
    var evals = 0
    var i = 0L
    while (i < data.length) {
      val v = data(i.toInt)
      truth.insert(v)
      policies.foreach(_.insert(v))
      i += 1
      if (i % period == 0 && i >= windowSize) {
        val exact = truth.evaluate()
        exacts += exact
        var p = 0
        while (p < policies.length) {
          val est = policies(p).evaluate()
          estimates(p) += est
          var q = 0
          while (q < phis.length) {
            val b = exact(q)
            sumAbsRel(p)(q) += (if (b != 0.0) math.abs(est(q) - b) / math.abs(b) else math.abs(est(q) - b))
            val r = Stat.rankOf(phis(q), windowSize)
            val (lo, hi) = truth.rankInterval(est(q))
            val dist = if (r >= lo && r <= hi) 0L else math.min(math.abs(r - lo), math.abs(r - hi))
            sumRankErr(p)(q) += dist.toDouble / windowSize
            q += 1
          }
          sumSpace(p) += policies(p).observedSpace
          p += 1
        }
        evals += 1
      }
    }
    require(evals > 0, "no window evaluations — data shorter than one window?")
    policies.zipWithIndex.map { case (pol, p) =>
      PolicyResult(
        policy = pol.name,
        phis = phis,
        valueErrorPct = phis.indices.map(q => 100.0 * sumAbsRel(p)(q) / evals).toArray,
        rankError = phis.indices.map(q => sumRankErr(p)(q) / evals).toArray,
        observedSpace = sumSpace(p) / evals,
        analyticalSpace = pol.analyticalSpace,
        evaluations = evals,
        estimates = estimates(p).toArray,
        exacts = exacts.toArray,
      )
    }
  }
}
