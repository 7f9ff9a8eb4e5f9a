package repro.baselines

import repro.core.{SlidingQuantilePolicy, Stat}
import scala.collection.mutable.ArrayDeque

/** Mergeable per-sub-window moment summary: count, min, max and *centered*
  * power sums of both x and log x (log sums valid only while all values are
  * > 0). Centering at the first observed value keeps every power-sum term at
  * the scale of the data spread, avoiding the catastrophic cancellation that
  * raw Σxʲ suffers when the data range is narrow relative to its magnitude
  * (e.g. latencies around 1e6). Merging shifts the other summary's sums to
  * this center (binomial recentering — benign, the shift distance is within
  * the data spread) and adds.
  */
final class MomentState(val k: Int) {
  var count: Long = 0L
  var min: Double = Double.PositiveInfinity
  var max: Double = Double.NegativeInfinity
  var allPositive: Boolean = true
  var refRaw: Double = 0.0 // center of powerSums (first value seen)
  var refLog: Double = 0.0 // center of logPowerSums
  val powerSums = new Array[Double](k + 1) // Σ (x - refRaw)^j
  val logPowerSums = new Array[Double](k + 1) // Σ (ln x - refLog)^j

  def add(v: Double): Unit = {
    if (count == 0) {
      refRaw = v
      refLog = if (v > 0) math.log(v) else 0.0
    }
    count += 1
    if (v < min) min = v
    if (v > max) max = v
    val y = v - refRaw
    var p = 1.0
    var j = 0
    while (j <= k) { powerSums(j) += p; p *= y; j += 1 }
    if (v <= 0) allPositive = false
    else {
      val ly = math.log(v) - refLog
      var lp = 1.0
      j = 0
      while (j <= k) { logPowerSums(j) += lp; lp *= ly; j += 1 }
    }
  }

  /** Sums of (y + delta)^j from sums of y^j (binomial shift). */
  private def shifted(sums: Array[Double], delta: Double): Array[Double] = {
    val out = new Array[Double](k + 1)
    var j = 0
    while (j <= k) {
      var acc = 0.0
      var i = 0
      var binom = 1.0
      // sum_i C(j,i) * delta^(j-i) * S_i
      while (i <= j) {
        acc += binom * math.pow(delta, (j - i).toDouble) * sums(i)
        binom = binom * (j - i) / (i + 1)
        i += 1
      }
      out(j) = acc
      j += 1
    }
    out
  }

  def mergeInPlace(o: MomentState): Unit = {
    require(o.k == k, "mismatched moment orders")
    if (o.count == 0) return
    if (count == 0) {
      refRaw = o.refRaw
      refLog = o.refLog
    }
    val shiftedRaw = o.shifted(o.powerSums, o.refRaw - refRaw)
    val shiftedLog = o.shifted(o.logPowerSums, o.refLog - refLog)
    count += o.count
    min = math.min(min, o.min)
    max = math.max(max, o.max)
    allPositive &&= o.allPositive
    var j = 0
    while (j <= k) {
      powerSums(j) += shiftedRaw(j)
      logPowerSums(j) += shiftedLog(j)
      j += 1
    }
  }

  def copy(): MomentState = {
    val c = new MomentState(k)
    c.mergeInPlace(this)
    c
  }

  /** Stored scalars: two power-sum arrays + count/min/max + two centers. */
  def observedSpace: Long = 2L * (k + 1) + 5
}

/** Maximum-entropy quantile estimation from moments (msketch design):
  * fit density exp(Σ λ_k T_k(s)) on the scaled support s ∈ [-1,1] whose
  * Chebyshev moments match the summary's, then invert the numeric CDF.
  * Heavy-tailed positive data is solved in log space.
  */
object MomentSolver {
  private val GridN = 513 // Simpson grid on [-1, 1] (odd)

  /** Chebyshev T_0..T_k coefficient rows in the power basis. */
  private def chebyCoeffs(k: Int): Array[Array[Double]] = {
    val t = Array.ofDim[Double](k + 1, k + 1)
    t(0)(0) = 1.0
    if (k >= 1) t(1)(1) = 1.0
    var i = 2
    while (i <= k) {
      var j = 0
      while (j <= k) {
        var c = -t(i - 2)(j)
        if (j >= 1) c += 2.0 * t(i - 1)(j - 1)
        t(i)(j) = c
        j += 1
      }
      i += 1
    }
    t
  }

  private def binomial(n: Int, r: Int): Double = {
    var acc = 1.0
    var i = 0
    while (i < r) { acc = acc * (n - i) / (i + 1); i += 1 }
    acc
  }

  /** Solve the maxent problem; returns the quantile function φ -> value in the
    * *scaled* domain mapped back to x-space, or None if Newton failed.
    */
  private def maxEntQuantiles(chebyMoments: Array[Double], phis: Array[Double]): Option[Array[Double]] = {
    val k = chebyMoments.length - 1
    val grid = Array.tabulate(GridN)(i => -1.0 + 2.0 * i / (GridN - 1))
    val simpson = Array.tabulate(GridN) { i =>
      val w = if (i == 0 || i == GridN - 1) 1.0 else if (i % 2 == 1) 4.0 else 2.0
      w * (2.0 / (GridN - 1)) / 3.0
    }
    // T_j evaluated on the grid via the cos identity (stable for any j)
    val tGrid = Array.ofDim[Double](k + 1, GridN)
    var j = 0
    while (j <= k) {
      var i = 0
      while (i < GridN) {
        tGrid(j)(i) = math.cos(j * math.acos(math.max(-1.0, math.min(1.0, grid(i)))))
        i += 1
      }
      j += 1
    }
    val lambda = new Array[Double](k + 1)
    lambda(0) = math.log(0.5) // uniform density on [-1,1]
    val density = new Array[Double](GridN)
    def computeDensity(l: Array[Double]): Boolean = {
      var i = 0
      while (i < GridN) {
        var p = 0.0
        var jj = 0
        while (jj <= k) { p += l(jj) * tGrid(jj)(i); jj += 1 }
        if (p > 700) return false // overflow guard
        density(i) = math.exp(p)
        i += 1
      }
      true
    }
    def potential(): Double = {
      var f = 0.0
      var i = 0
      while (i < GridN) { f += simpson(i) * density(i); i += 1 }
      var jj = 0
      while (jj <= k) { f -= lambda(jj) * chebyMoments(jj); jj += 1 }
      f
    }
    if (!computeDensity(lambda)) return None
    var fCur = potential()
    var iter = 0
    var converged = false
    while (iter < 200 && !converged) {
      // gradient and Hessian under current density
      val g = new Array[Double](k + 1)
      val h = Array.ofDim[Double](k + 1, k + 1)
      var i = 0
      while (i < GridN) {
        val wd = simpson(i) * density(i)
        var a = 0
        while (a <= k) {
          g(a) += wd * tGrid(a)(i)
          var b = a
          while (b <= k) { h(a)(b) += wd * tGrid(a)(i) * tGrid(b)(i); b += 1 }
          a += 1
        }
        i += 1
      }
      var a = 0
      while (a <= k) {
        g(a) -= chebyMoments(a)
        var b = 0
        while (b < a) { h(a)(b) = h(b)(a); b += 1 }
        a += 1
      }
      val gNorm = g.iterator.map(math.abs).max
      if (gNorm < 1e-10) converged = true
      else {
        val step = solveSymmetric(h, g.map(-_)).getOrElse(return None)
        // damped line search on the convex potential
        var t = 1.0
        var improved = false
        val base = lambda.clone()
        while (t > 1e-6 && !improved) {
          var jj = 0
          while (jj <= k) { lambda(jj) = base(jj) + t * step(jj); jj += 1 }
          if (computeDensity(lambda)) {
            val f2 = potential()
            if (f2.isFinite && f2 <= fCur + 1e-12) { fCur = f2; improved = true }
          }
          if (!improved) t /= 2.0
        }
        if (!improved) {
          System.arraycopy(base, 0, lambda, 0, k + 1)
          computeDensity(lambda)
          converged = true // stalled; use best-so-far density
        }
      }
      iter += 1
    }
    // CDF by cumulative trapezoid over the grid, then invert per φ
    val cdf = new Array[Double](GridN)
    var i = 1
    while (i < GridN) {
      cdf(i) = cdf(i - 1) + 0.5 * (density(i) + density(i - 1)) * (grid(i) - grid(i - 1))
      i += 1
    }
    val total = cdf(GridN - 1)
    if (!(total > 0) || !total.isFinite) return None
    Some(phis.map { phi =>
      val target = phi * total
      var lo = 0
      var hi = GridN - 1
      while (lo < hi) {
        val mid = (lo + hi) >>> 1
        if (cdf(mid) < target) lo = mid + 1 else hi = mid
      }
      if (lo == 0) grid(0)
      else {
        val c0 = cdf(lo - 1); val c1 = cdf(lo)
        val frac = if (c1 > c0) (target - c0) / (c1 - c0) else 0.5
        grid(lo - 1) + frac * (grid(lo) - grid(lo - 1))
      }
    })
  }

  /** Gaussian elimination with partial pivoting for the (small) Newton system. */
  private def solveSymmetric(hIn: Array[Array[Double]], b: Array[Double]): Option[Array[Double]] = {
    val n = b.length
    val a = Array.tabulate(n, n)((i, j) => hIn(i)(j))
    val x = b.clone()
    var col = 0
    while (col < n) {
      var piv = col
      var row = col + 1
      while (row < n) { if (math.abs(a(row)(col)) > math.abs(a(piv)(col))) piv = row; row += 1 }
      if (math.abs(a(piv)(col)) < 1e-300) return None
      if (piv != col) { val t = a(piv); a(piv) = a(col); a(col) = t
        val tb = x(piv); x(piv) = x(col); x(col) = tb }
      row = col + 1
      while (row < n) {
        val f = a(row)(col) / a(col)(col)
        var c = col
        while (c < n) { a(row)(c) -= f * a(col)(c); c += 1 }
        x(row) -= f * x(col)
        row += 1
      }
      col += 1
    }
    var i = n - 1
    while (i >= 0) {
      var s = x(i)
      var jj = i + 1
      while (jj < n) { s -= a(i)(jj) * x(jj); jj += 1 }
      if (!((s / a(i)(i)).isFinite)) return None
      x(i) = s / a(i)(i)
      i -= 1
    }
    Some(x)
  }

  /** Estimate the φ-quantiles from a merged moment state, trying the full
    * order first and degrading gracefully (lower order → two-moment
    * log-normal/normal fit) if the solve is numerically infeasible.
    */
  def quantiles(state: MomentState, phis: Array[Double]): Array[Double] = {
    require(state.count > 0, "quantiles of empty state")
    val useLog = state.allPositive && state.min > 0
    val sums = if (useLog) state.logPowerSums else state.powerSums
    val ref = if (useLog) state.refLog else state.refRaw
    val a = if (useLog) math.log(state.min) else state.min
    val b = if (useLog) math.log(state.max) else state.max
    def back(x: Double): Double = if (useLog) math.exp(x) else x
    if (b - a < 1e-12) return phis.map(_ => state.min)
    var k = state.k
    while (k >= 4) {
      val cheby = chebyMomentsFromPowerSums(sums, state.count, a, b, ref, k)
      if (cheby.forall(_.isFinite)) {
        maxEntQuantiles(cheby, phis) match {
          case Some(sq) =>
            return sq.map(s => back(a + (s + 1.0) * (b - a) / 2.0))
          case None => // degrade order and retry
        }
      }
      k -= 2
    }
    // final fallback: two-moment fit in the chosen space (sums are centered
    // at ref, so the mean must be shifted back)
    val meanC = sums(1) / state.count
    val mean = ref + meanC
    val varr = math.max(1e-12, sums(2) / state.count - meanC * meanC)
    val sd = math.sqrt(varr)
    phis.map { phi =>
      val z = Stat.inverseNormalCdf(math.min(1.0 - 1e-12, math.max(1e-12, phi)))
      math.min(state.max, math.max(state.min, back(mean + sd * z)))
    }
  }

  /** E[T_j(s)] for s = 2(x-a)/(b-a) - 1 from power sums of y = x - ref.
    * With ref inside [a, b] both |α·y| ≤ 2 and |β| ≤ 1, so the binomial
    * expansion has no catastrophic cancellation.
    */
  private[baselines] def chebyMomentsFromPowerSums(
      sums: Array[Double], count: Long, a: Double, b: Double, ref: Double,
      k: Int): Array[Double] = {
    val alpha = 2.0 / (b - a)
    val beta = 2.0 * (ref - a) / (b - a) - 1.0
    val raw = Array.tabulate(k + 1)(j => sums(j) / count) // E[y^j]
    // E[s^j] via binomial expansion of (αy + β)^j
    val sm = new Array[Double](k + 1)
    var j = 0
    while (j <= k) {
      var acc = 0.0
      var i = 0
      while (i <= j) {
        acc += binomial(j, i) * math.pow(alpha, i) * math.pow(beta, j - i) * raw(i)
        i += 1
      }
      sm(j) = acc
      j += 1
    }
    val t = chebyCoeffs(k)
    Array.tabulate(k + 1) { kk =>
      var acc = 0.0
      var jj = 0
      while (jj <= kk) { acc += t(kk)(jj) * sm(jj); jj += 1 }
      acc
    }
  }
}

/** Moment — mergeable moment-based quantile sketch (paper §5.1 policy (5)). */
final class MomentSketchPolicy(
    val windowSize: Long,
    val period: Long,
    val phis: Array[Double],
    val momentK: Int = 12,
) extends SlidingQuantilePolicy {
  require(windowSize % period == 0, "window must be a multiple of period")

  private val nSub = (windowSize / period).toInt
  private val sealed_ = new ArrayDeque[MomentState](nSub + 1)
  private var inflight = new MomentState(momentK)

  override def name: String = "Moment"

  override def insert(v: Double): Unit = {
    inflight.add(v)
    if (inflight.count == period) {
      sealed_.append(inflight)
      if (sealed_.length > nSub) sealed_.removeHead()
      inflight = new MomentState(momentK)
    }
  }

  override def evaluate(): Array[Double] = {
    require(sealed_.length == nSub, s"window not full: ${sealed_.length}/$nSub states")
    val merged = new MomentState(momentK)
    sealed_.foreach(merged.mergeInPlace)
    MomentSolver.quantiles(merged, phis)
  }

  override def observedSpace: Long =
    sealed_.iterator.map(_.observedSpace).sum + inflight.observedSpace
}
