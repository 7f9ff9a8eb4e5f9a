package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Stat
import repro.harness.SlidingEval

class RandomSamplingSpec extends AnyFunSuite {
  private val phis = Array(0.5, 0.9, 0.99)

  test("full-coverage sampling (budget >= window) is exact at the weighted rank") {
    val rnd = new scala.util.Random(71)
    // per-sub budget = min(period, total/n) = period here -> every element kept
    val pol = new RandomSampling(1000, 250, Array(0.5), epsilon = 0.02)
    val data = Array.fill(1000)(rnd.nextInt(500).toDouble)
    data.foreach(pol.insert)
    assert(pol.evaluate()(0) == Stat.exactQuantile(data, 0.5))
  }

  test("rank error is small with the default budget (probabilistic, seeded)") {
    val rnd = new scala.util.Random(72)
    val data = Array.fill(40000)(rnd.nextDouble() * 10000)
    val res = SlidingEval.run(data, 8000, 2000, phis,
      Seq(new RandomSampling(8000, 2000, phis, 0.02))).head
    res.rankError.zip(phis).foreach { case (e, phi) =>
      assert(e <= 0.02, s"phi=$phi rank error $e")
    }
  }

  test("subsampling actually happens for large sub-windows") {
    val pol = new RandomSampling(131072, 16384, phis, 0.02)
    val rnd = new scala.util.Random(73)
    (1 to 131072).foreach(_ => pol.insert(rnd.nextDouble()))
    assert(pol.observedSpace < 131072, s"space ${pol.observedSpace}")
    assert(pol.observedSpace > 10000) // ~45K budget split over 8 sub-windows
    assert(pol.analyticalSpace > 40000 && pol.analyticalSpace < 50000)
  }

  test("expired sub-windows stop influencing results") {
    val pol = new RandomSampling(1000, 500, Array(0.5), 0.02)
    (1 to 1000).foreach(_ => pol.insert(1000.0))
    assert(pol.evaluate()(0) == 1000.0)
    (1 to 1000).foreach(_ => pol.insert(5.0))
    assert(pol.evaluate()(0) == 5.0)
  }

  test("evaluate before full window fails") {
    val pol = new RandomSampling(1000, 500, phis, 0.02)
    (1 to 600).foreach(i => pol.insert(i.toDouble))
    intercept[IllegalArgumentException](pol.evaluate())
  }

  test("deterministic for a fixed seed") {
    def run(seed: Long): Seq[Double] = {
      val pol = new RandomSampling(2000, 500, phis, 0.05, seed = seed)
      val rnd = new scala.util.Random(74)
      (1 to 2000).foreach(_ => pol.insert(rnd.nextDouble() * 100))
      pol.evaluate().toSeq
    }
    assert(run(1) == run(1))
  }

  test("reservoir samples are unbiased enough for the median (loose check)") {
    val rnd = new scala.util.Random(75)
    val data = Array.fill(65536)(rnd.nextGaussian() * 10 + 100)
    val res = SlidingEval.run(data, 32768, 8192, Array(0.5),
      Seq(new RandomSampling(32768, 8192, Array(0.5), 0.02))).head
    assert(res.valueErrorPct(0) < 1.0, s"median error ${res.valueErrorPct(0)}%")
  }
}
