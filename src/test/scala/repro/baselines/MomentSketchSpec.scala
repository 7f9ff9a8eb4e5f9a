package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Stat
import repro.harness.SlidingEval

class MomentSketchSpec extends AnyFunSuite {
  private val phis = Array(0.5, 0.9, 0.99)

  test("moment state accumulates count, min, max and power sums") {
    val st = new MomentState(4)
    Seq(1.0, 2.0, 3.0).foreach(st.add)
    assert(st.count == 3 && st.min == 1.0 && st.max == 3.0)
    assert(st.refRaw == 1.0) // centered at the first value
    assert(st.powerSums(0) == 3.0)
    assert(st.powerSums(1) == 3.0) // (1-1) + (2-1) + (3-1)
    assert(st.powerSums(2) == 5.0) // 0 + 1 + 4
    assert(st.allPositive)
  }

  test("negative values disable the log path") {
    val st = new MomentState(4)
    Seq(1.0, -2.0).foreach(st.add)
    assert(!st.allPositive)
  }

  test("merge equals accumulating the concatenation") {
    val rnd = new scala.util.Random(81)
    val a = new MomentState(6)
    val b = new MomentState(6)
    val all = new MomentState(6)
    a.add(50.0); all.add(50.0) // shared first value -> identical centers
    (1 to 500).foreach { _ =>
      val v = 1.0 + rnd.nextDouble() * 100
      if (rnd.nextBoolean()) a.add(v) else b.add(v)
      all.add(v)
    }
    a.mergeInPlace(b)
    assert(a.count == all.count && a.min == all.min && a.max == all.max)
    assert(a.refRaw == all.refRaw)
    (0 to 6).foreach { j =>
      val tol = 1e-6 * math.max(1.0, math.abs(all.powerSums(j)))
      assert(math.abs(a.powerSums(j) - all.powerSums(j)) <= tol, s"order $j")
    }
  }

  test("chebyshev moments of symmetric data vanish at odd orders") {
    // data symmetric around the midpoint of [min, max] in linear space
    val sums = new Array[Double](5)
    val vals = Seq(-1.0, -0.5, 0.0, 0.5, 1.0)
    vals.foreach { v =>
      var p = 1.0
      (0 to 4).foreach { j => sums(j) += p; p *= v }
    }
    val c = MomentSolver.chebyMomentsFromPowerSums(sums, vals.length, -1.0, 1.0, 0.0, 4)
    assert(math.abs(c(0) - 1.0) < 1e-12)
    assert(math.abs(c(1)) < 1e-12)
    assert(math.abs(c(3)) < 1e-12)
  }

  test("quantiles of uniform data are close to linear interpolation") {
    val st = new MomentState(8)
    (0 until 10000).foreach(i => st.add(100.0 + i * 0.01)) // uniform on [100, 200)
    val q = MomentSolver.quantiles(st, Array(0.25, 0.5, 0.75))
    assert(math.abs(q(0) - 125.0) / 125.0 < 0.02, s"q25 = ${q(0)}")
    assert(math.abs(q(1) - 150.0) / 150.0 < 0.02, s"q50 = ${q(1)}")
    assert(math.abs(q(2) - 175.0) / 175.0 < 0.02, s"q75 = ${q(2)}")
  }

  test("quantiles of lognormal data are accurate in the body") {
    val st = new MomentState(12)
    val n = 50000
    (0 until n).foreach(i =>
      st.add(math.exp(5.0 + 0.5 * Stat.inverseNormalCdf(Stat.uniform(1, i)))))
    val q = MomentSolver.quantiles(st, Array(0.5, 0.9))
    val want50 = math.exp(5.0)
    val want90 = math.exp(5.0 + 0.5 * 1.2816)
    assert(math.abs(q(0) - want50) / want50 < 0.05, s"q50 = ${q(0)} want $want50")
    assert(math.abs(q(1) - want90) / want90 < 0.08, s"q90 = ${q(1)} want $want90")
  }

  test("constant data returns that constant") {
    val st = new MomentState(12)
    (1 to 100).foreach(_ => st.add(42.0))
    assert(MomentSolver.quantiles(st, phis).forall(_ == 42.0))
  }

  test("quantile output is monotone in phi") {
    val st = new MomentState(12)
    val data = repro.data.Telemetry.netmon(20000).toArray
    data.foreach(st.add)
    val q = MomentSolver.quantiles(st, Array(0.1, 0.5, 0.9, 0.99))
    (1 until q.length).foreach(i => assert(q(i) >= q(i - 1) - 1e-9, q.toSeq.toString))
  }

  test("estimates stay inside [min, max]") {
    val st = new MomentState(12)
    val rnd = new scala.util.Random(82)
    (1 to 5000).foreach(_ => st.add(math.pow(rnd.nextDouble(), -1.1)))
    val q = MomentSolver.quantiles(st, Array(0.01, 0.5, 0.999))
    q.foreach(v => assert(v >= st.min - 1e-9 && v <= st.max + 1e-9))
  }

  test("policy slides: expired sub-windows stop influencing results") {
    val pol = new MomentSketchPolicy(1000, 500, Array(0.5), 6)
    val rnd = new scala.util.Random(83)
    (1 to 1000).foreach(_ => pol.insert(1000.0 + rnd.nextDouble()))
    assert(math.abs(pol.evaluate()(0) - 1000.5) < 5)
    (1 to 1000).foreach(_ => pol.insert(5.0 + rnd.nextDouble() * 0.1))
    assert(pol.evaluate()(0) < 10)
  }

  test("policy error on normal sliding data is modest") {
    val rnd = new scala.util.Random(84)
    val data = Array.fill(20000)(1e6 + 5e4 * rnd.nextGaussian())
    val res = SlidingEval.run(data, 8000, 2000, phis,
      Seq(new MomentSketchPolicy(8000, 2000, phis, 12))).head
    res.valueErrorPct.zip(phis).foreach { case (e, phi) =>
      assert(e < 3.0, s"phi=$phi error $e%")
    }
  }

  test("evaluate before full window fails") {
    val pol = new MomentSketchPolicy(1000, 500, phis)
    (1 to 700).foreach(i => pol.insert(i.toDouble))
    intercept[IllegalArgumentException](pol.evaluate())
  }

  test("observedSpace is constant in data volume") {
    val pol = new MomentSketchPolicy(2000, 500, phis, 12)
    val rnd = new scala.util.Random(85)
    (1 to 2000).foreach(_ => pol.insert(rnd.nextDouble() * 1e5))
    // 4 sealed states + 1 in-flight, each 2*(k+1)+5 scalars
    assert(pol.observedSpace == 5L * (2 * 13 + 5))
  }
}
