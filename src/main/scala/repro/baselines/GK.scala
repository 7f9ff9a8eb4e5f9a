package repro.baselines

import scala.collection.mutable.ArrayBuffer

/** Greenwald–Khanna ε-approximate quantile summary (the building block of the
  * CMQS and AM baselines).
  *
  * Tuples (v, g, Δ) sorted by value with the GK invariant
  * `g_i + Δ_i ≤ ⌊2εn⌋`; rmin/rmax rank bounds follow the standard
  * construction. We use the band-less compress (merge a tuple into its
  * successor whenever the invariant allows), which preserves correctness and
  * is the common practical implementation.
  */
final class GKSketch(val epsilon: Double) {
  require(epsilon > 0 && epsilon < 1, s"epsilon must be in (0,1), got $epsilon")

  // Parallel arrays for cache-friendliness; sorted by value ascending.
  private[baselines] val vs = new ArrayBuffer[Double]()
  private[baselines] val gs = new ArrayBuffer[Long]()
  private[baselines] val ds = new ArrayBuffer[Long]()
  private var n = 0L
  private var sinceCompress = 0L
  private val compressEvery = math.max(1L, (1.0 / (2.0 * epsilon)).toLong)

  def count: Long = n
  def tupleCount: Int = vs.length

  /** Stored scalars: three per tuple. */
  def observedSpace: Long = 3L * vs.length

  private def insertionIndex(v: Double): Int = {
    var lo = 0
    var hi = vs.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (vs(mid) < v) lo = mid + 1 else hi = mid
    }
    lo
  }

  def insert(v: Double): Unit = {
    val i = insertionIndex(v)
    val cap = math.floor(2.0 * epsilon * n).toLong
    if (i == 0 || i == vs.length) {
      // new min or max — exact tuple
      vs.insert(i, v); gs.insert(i, 1L); ds.insert(i, 0L)
    } else {
      vs.insert(i, v); gs.insert(i, 1L); ds.insert(i, math.max(0L, cap - 1L))
    }
    n += 1
    sinceCompress += 1
    if (sinceCompress >= compressEvery) { compress(); sinceCompress = 0 }
  }

  private def compress(): Unit = {
    val cap = math.floor(2.0 * epsilon * n).toLong
    var i = vs.length - 2
    while (i >= 1) { // never merge away the minimum (index 0)
      if (gs(i) + gs(i + 1) + ds(i + 1) <= cap) {
        gs(i + 1) += gs(i)
        vs.remove(i); gs.remove(i); ds.remove(i)
      }
      i -= 1
    }
  }

  /** Lower/upper bounds on |{x ≤ v}| over the summarized data. */
  def rankBounds(v: Double): (Long, Long) = {
    if (n == 0) return (0L, 0L)
    // last index with vs(i) <= v
    var lo = -1
    var hi = vs.length - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) >>> 1
      if (vs(mid) <= v) lo = mid else hi = mid - 1
    }
    val i = lo
    if (i < 0) (0L, 0L)
    else {
      var rmin = 0L
      var j = 0
      while (j <= i) { rmin += gs(j); j += 1 }
      val upper = if (i == vs.length - 1) n else math.max(rmin, rmin + gs(i + 1) + ds(i + 1) - 1)
      (rmin, upper)
    }
  }

  /** ε-approximate value for target rank `r` (1-based). */
  def query(r: Long): Double = {
    require(n > 0, "query on empty sketch")
    val bound = math.ceil(epsilon * n).toLong
    var rmin = 0L
    var i = 0
    while (i < vs.length) {
      rmin += gs(i)
      val rmax = rmin + ds(i)
      if (r - rmin <= bound && rmax - r <= bound) return vs(i)
      i += 1
    }
    vs(vs.length - 1)
  }

  /** All tuple values (candidates for merged queries), ascending. */
  def values: Array[Double] = vs.toArray
}

/** Query across several GK sketches (disjoint data) by summing rank bounds. */
object GKMerge {

  /** Immutable snapshot of one sketch with prefix sums, for O(log) bounds. */
  private final class Snap(val vs: Array[Double], prefixG: Array[Long],
                           gs: Array[Long], ds: Array[Long], n: Long) {
    /** Lower/upper bounds on |{x ≤ v}| (mirrors GKSketch.rankBounds). */
    def bounds(v: Double): (Long, Long) = {
      var lo = -1
      var hi = vs.length - 1
      while (lo < hi) {
        val mid = (lo + hi + 1) >>> 1
        if (vs(mid) <= v) lo = mid else hi = mid - 1
      }
      if (lo < 0) (0L, 0L)
      else {
        val rmin = prefixG(lo)
        val upper =
          if (lo == vs.length - 1) n
          else math.max(rmin, rmin + gs(lo + 1) + ds(lo + 1) - 1)
        (rmin, upper)
      }
    }
  }

  private def snap(s: GKSketch): Snap = {
    val vs = s.vs.toArray
    val gs = s.gs.toArray
    val ds = s.ds.toArray
    val prefix = new Array[Long](gs.length)
    var acc = 0L
    var i = 0
    while (i < gs.length) { acc += gs(i); prefix(i) = acc; i += 1 }
    new Snap(vs, prefix, gs, ds, s.count)
  }

  /** For each target rank, the largest candidate value (union of tuple
    * values) whose summed rank-interval midpoint does not exceed the rank —
    * the conservative GK answer rule lifted to the merged summary. Rank
    * error stays within the summed per-sketch uncertainty; at heavy tails it
    * biases toward the dense region (undershoot), like the sketches the
    * paper evaluates, instead of jumping deep into the sparse tail.
    */
  def queryMany(sketches: Seq[GKSketch], ranks: Array[Long]): Array[Double] = {
    val snaps = sketches.filter(_.count > 0).map(snap)
    require(snaps.nonEmpty, "merged query over empty sketches")
    val candidates = snaps.iterator.flatMap(_.vs).toArray.distinct.sorted
    val out = new Array[Double](ranks.length)
    val mids = new Array[Long](candidates.length)
    var i = 0
    while (i < candidates.length) {
      var lo = 0L
      var hi = 0L
      snaps.foreach { s =>
        val (l, h) = s.bounds(candidates(i))
        lo += l; hi += h
      }
      mids(i) = (lo + hi) / 2
      i += 1
    }
    var q = 0
    while (q < ranks.length) {
      var j = 0
      var ans = candidates(0)
      while (j < candidates.length && mids(j) <= ranks(q)) {
        ans = candidates(j)
        j += 1
      }
      out(q) = ans
      q += 1
    }
    out
  }

  def query(sketches: Seq[GKSketch], r: Long): Double =
    queryMany(sketches, Array(r))(0)
}
