package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.ExactSliding
import repro.core.{FewKConfig, Qlove}

class SlidingEvalSpec extends AnyFunSuite {
  private val phis = Array(0.5, 0.9)

  test("the Exact policy measures zero value and rank error") {
    val rnd = new scala.util.Random(21)
    val data = Array.fill(5000)(rnd.nextDouble() * 100)
    val res = SlidingEval.run(data, 1000, 500, phis,
      Seq(new ExactSliding(1000, phis))).head
    assert(res.valueErrorPct.forall(_ == 0.0))
    assert(res.rankError.forall(_ == 0.0))
  }

  test("evaluation count follows (len - N) / P + 1") {
    val data = Array.tabulate(5000)(_.toDouble)
    val res = SlidingEval.run(data, 1000, 500, phis,
      Seq(new ExactSliding(1000, phis))).head
    assert(res.evaluations == (5000 - 1000) / 500 + 1)
    assert(res.estimates.length == res.evaluations)
    assert(res.exacts.length == res.evaluations)
  }

  test("trailing partial periods do not trigger evaluations") {
    val data = Array.tabulate(1300)(_.toDouble)
    val res = SlidingEval.run(data, 1000, 500, phis,
      Seq(new ExactSliding(1000, phis))).head
    assert(res.evaluations == 1)
  }

  test("rejects data shorter than one window") {
    intercept[IllegalArgumentException](
      SlidingEval.run(new Array[Double](10), 100, 50, phis, Seq.empty))
  }

  test("rejects misaligned window/period") {
    intercept[IllegalArgumentException](
      SlidingEval.run(new Array[Double](1000), 100, 33, phis, Seq.empty))
  }

  test("approximate policy error is measured against the exact window") {
    val rnd = new scala.util.Random(22)
    // wide uniform: quantization alone introduces a small measurable error
    val data = Array.fill(4000)(1000.0 + rnd.nextDouble() * 8999)
    val res = SlidingEval.run(data, 1000, 500, phis,
      Seq(new Qlove(1000, 500, phis, FewKConfig.disabled(phis)))).head
    assert(res.valueErrorPct.forall(e => e >= 0.0 && e < 10.0))
    assert(res.valueErrorPct.exists(_ > 0.0))
  }

  test("multiple policies see the same stream and ground truth") {
    val rnd = new scala.util.Random(23)
    val data = Array.fill(3000)(rnd.nextDouble() * 50)
    val res = SlidingEval.run(data, 1000, 1000, phis, Seq(
      new ExactSliding(1000, phis),
      new Qlove(1000, 1000, phis, FewKConfig.disabled(phis), 0)))
    assert(res(0).exacts.map(_.toSeq).toSeq == res(1).exacts.map(_.toSeq).toSeq)
    // tumbling QLOVE without quantization is exact up to the 1-ulp drift of
    // the paper's incremental Level-2 sum (sum += new; sum -= expired)
    assert(res(1).valueErrorPct.forall(_ < 1e-10))
  }

  test("observedSpace is averaged and positive") {
    val data = Array.tabulate(3000)(_.toDouble)
    val res = SlidingEval.run(data, 1000, 500, phis,
      Seq(new ExactSliding(1000, phis))).head
    assert(res.observedSpace > 1000)
  }

  test("zero exact values do not blow up relative error") {
    val data = Array.fill(2000)(0.0)
    val res = SlidingEval.run(data, 1000, 500, phis,
      Seq(new ExactSliding(1000, phis))).head
    assert(res.valueErrorPct.forall(_ == 0.0))
  }
}
