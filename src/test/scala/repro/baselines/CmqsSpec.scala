package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Stat
import repro.harness.SlidingEval

class CmqsSpec extends AnyFunSuite {
  private val phis = Array(0.5, 0.9, 0.99)

  test("rank error stays within epsilon over a sliding run") {
    val rnd = new scala.util.Random(51)
    val data = Array.fill(8000)(rnd.nextDouble() * 10000)
    val eps = 0.02
    val res = SlidingEval.run(data, 2000, 500, phis,
      Seq(new Cmqs(2000, 500, phis, eps))).head
    res.rankError.zip(phis).foreach { case (e, phi) =>
      assert(e <= eps, s"phi=$phi rank error $e > $eps")
    }
  }

  test("evaluate before full window fails") {
    val pol = new Cmqs(1000, 500, phis, 0.02)
    (1 to 700).foreach(i => pol.insert(i.toDouble))
    intercept[IllegalArgumentException](pol.evaluate())
  }

  test("expired sub-windows stop influencing results") {
    val pol = new Cmqs(1000, 500, Array(0.5), 0.02)
    (1 to 1000).foreach(_ => pol.insert(1000.0))
    assert(pol.evaluate()(0) == 1000.0)
    (1 to 1000).foreach(_ => pol.insert(5.0))
    assert(pol.evaluate()(0) == 5.0)
  }

  test("tumbling configuration works (N = P)") {
    val rnd = new scala.util.Random(52)
    val pol = new Cmqs(1000, 1000, Array(0.5), 0.05)
    val data = Array.fill(1000)(rnd.nextDouble() * 100)
    data.foreach(pol.insert)
    val v = pol.evaluate()(0)
    val sorted = data.sorted
    val r = Stat.rankOf(0.5, 1000)
    val idx = sorted.indexWhere(_ == v)
    assert(math.abs(idx + 1 - r) <= 0.05 * 1000 + 1)
  }

  test("space is far below the window size and tracks tuple counts") {
    val rnd = new scala.util.Random(53)
    val pol = new Cmqs(4000, 1000, phis, 0.02)
    (1 to 4000).foreach(_ => pol.insert(rnd.nextDouble() * 1000))
    assert(pol.observedSpace > 0)
    assert(pol.observedSpace < 4000, s"space ${pol.observedSpace}")
    assert(pol.analyticalSpace > 0)
  }

  test("misaligned window/period rejected") {
    intercept[IllegalArgumentException](new Cmqs(1000, 300, phis, 0.02))
  }

  test("heavy-tail value error at high quantiles exceeds QLOVE-style accuracy") {
    // the motivating observation: rank-bounded answers miss tail values
    val data = repro.data.Telemetry.netmon(40000).toArray
    val ph = Array(0.999)
    val res = SlidingEval.run(data, 8000, 1000, ph,
      Seq(new Cmqs(8000, 1000, ph, 0.02))).head
    assert(res.rankError(0) <= 0.02)
    // value error is structurally large relative to the rank error
    assert(res.valueErrorPct(0) > 1.0, s"tail value error ${res.valueErrorPct(0)}%")
  }
}
