package repro.core

import org.scalatest.funsuite.AnyFunSuite

class QloveEstimatorSpec extends AnyFunSuite {
  private val phis = Array(0.5, 0.99)

  private def driverSummaries(data: Array[Double], n: Long, p: Long,
                              cfg: FewKConfig): IndexedSeq[SubWindowSummary] = {
    var prev: Array[Array[Double]] = phis.map(_ => Array.emptyDoubleArray)
    data.grouped(p.toInt).map { chunk =>
      val sk = new FreqSketch
      chunk.foreach(sk.accumulate)
      val s = SubWindowSummary.fromSketch(sk, cfg, prev)
      prev = SubWindowSummary.pools(sk, cfg)
      s
    }.toIndexedSeq
  }

  test("fromPools rebuilds identical summaries from raw pools") {
    val rnd = new scala.util.Random(11)
    val n = 800L
    val p = 200L
    val cfg = FewKConfig.sampleOnly(n, phis, 0.5)
    val data = Array.fill(n.toInt)(rnd.nextDouble() * 1000)
    val direct = driverSummaries(data, n, p, cfg)
    val rebuilt = direct.map { s =>
      // recover pools: samples with step s reconstruct only if step == 1, so
      // build pools directly from the data for this check
      s
    }
    // compare estimate paths instead: fromPools over explicit pools
    var prevPools: Array[Array[Double]] = phis.map(_ => Array.emptyDoubleArray)
    val viaPools = data.grouped(p.toInt).map { chunk =>
      val sk = new FreqSketch
      chunk.foreach(sk.accumulate)
      val pools = phis.indices.map(i => sk.topValues(cfg.poolSize(i))).toArray
      val bursty = phis.indices.map(i =>
        cfg.sampleEnabled(i) && prevPools(i).nonEmpty &&
          MannWhitney.isStochasticallyLarger(pools(i), prevPools(i), cfg.burstAlpha)).toArray
      prevPools = pools
      QloveEstimator.fromPools(chunk.length, sk.computeResult(phis), pools, bursty, cfg)
    }.toIndexedSeq
    direct.zip(viaPools).foreach { case (a, b) =>
      assert(a.count == b.count)
      assert(a.quantiles.sameElements(b.quantiles))
      phis.indices.foreach { i =>
        assert(a.samples(i).sameElements(b.samples(i)), s"samples phi=$i")
        assert(a.topK(i).sameElements(b.topK(i)), s"topk phi=$i")
        assert(a.bursty(i) == b.bursty(i))
      }
    }
  }

  test("estimate equals the Qlove operator's evaluate on the same stream") {
    val rnd = new scala.util.Random(12)
    val n = 1000L
    val p = 250L
    for (cfg <- Seq(FewKConfig.disabled(phis),
                    FewKConfig.topOnly(n, p, phis, 0.5),
                    FewKConfig.sampleOnly(n, phis, 0.5))) {
      val data = Array.fill(n.toInt)(rnd.nextDouble() * 5000)
      val op = new Qlove(n, p, phis, cfg, 0)
      data.foreach(op.insert)
      val viaOp = op.evaluate()
      val viaEst = QloveEstimator.estimate(driverSummaries(data, n, p, cfg), cfg, n)
      phis.indices.foreach { i =>
        assert(math.abs(viaOp(i) - viaEst(i)) <= 1e-9 * math.abs(viaEst(i)),
          s"cfg=$cfg phi=${phis(i)}: ${viaOp(i)} vs ${viaEst(i)}")
      }
    }
  }

  test("estimate rejects empty input") {
    intercept[IllegalArgumentException](
      QloveEstimator.estimate(IndexedSeq.empty, FewKConfig.disabled(phis), 100))
  }

  test("level-2 mean path matches hand computation") {
    val cfg = FewKConfig.disabled(phis)
    val mk = (q: Double) => SubWindowSummary(10, Array(q, q * 2),
      phis.map(_ => Array.emptyDoubleArray), phis.map(_ => Array.emptyDoubleArray),
      phis.map(_ => false))
    val est = QloveEstimator.estimate(IndexedSeq(mk(10), mk(20), mk(30)), cfg, 30)
    assert(est(0) == 20.0 && est(1) == 40.0)
  }
}
