package repro.core

/** Window-level estimate selection shared by the driver operator
  * ([[Qlove]]), the Spark batch pipeline and the Structured Streaming
  * operator, so all three paths answer identically (§4.3 "Selecting
  * outcomes").
  */
object QloveEstimator {

  /** Rebuild a [[SubWindowSummary]] from a raw descending tail pool per φ
    * (the form the Spark aggregate emits): top-k cache is the pool prefix,
    * samples are the interval sample of the pool.
    */
  def fromPools(count: Long, quantiles: Array[Double],
                pools: Array[Array[Double]], bursty: Array[Boolean],
                cfg: FewKConfig): SubWindowSummary = {
    val topK = cfg.phis.indices.map { i =>
      if (cfg.topEnabled(i)) pools(i).take(math.min(cfg.topK(i), pools(i).length))
      else Array.emptyDoubleArray
    }.toArray
    val samples = cfg.phis.indices.map { i =>
      if (cfg.sampleEnabled(i)) FewK.intervalSample(pools(i), cfg.sampleStep(i))
      else Array.emptyDoubleArray
    }.toArray
    SubWindowSummary(count, quantiles, topK, samples, bursty)
  }

  /** Per-φ estimate for a full window of `summaries` (oldest first):
    * sample-k when the window holds a bursty sub-window, top-k for
    * statistically inefficient quantiles, Level-2 mean otherwise.
    */
  def estimate(summaries: IndexedSeq[SubWindowSummary], cfg: FewKConfig,
               windowSize: Long): Array[Double] = {
    val phis = cfg.phis
    val n = summaries.length
    require(n > 0, "estimate over no summaries")
    val out = new Array[Double](phis.length)
    var i = 0
    while (i < phis.length) {
      val burstyWindow = cfg.sampleEnabled(i) && summaries.exists(_.bursty(i))
      val t = FewK.depthFromTop(windowSize, phis(i))
      out(i) =
        if (burstyWindow)
          FewK.mergeSampleK(summaries.map(s => (s.samples(i),
            FewK.sampleWeight(math.min(cfg.poolSize(i).toLong, s.count).toInt,
              s.samples(i).length))), t)
        else if (cfg.topEnabled(i))
          FewK.mergeTopK(summaries.map(_.topK(i)), t)
        else {
          var s = 0.0
          var j = 0
          while (j < n) { s += summaries(j).quantiles(i); j += 1 }
          s / n
        }
      i += 1
    }
    out
  }
}
