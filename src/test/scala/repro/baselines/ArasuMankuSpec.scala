package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.SlidingEval

class ArasuMankuSpec extends AnyFunSuite {
  private val phis = Array(0.5, 0.9, 0.99)

  test("rank error stays within epsilon over a sliding run") {
    val rnd = new scala.util.Random(61)
    val data = Array.fill(8000)(rnd.nextDouble() * 10000)
    val eps = 0.02
    val res = SlidingEval.run(data, 2000, 500, phis,
      Seq(new ArasuManku(2000, 500, phis, eps))).head
    res.rankError.zip(phis).foreach { case (e, phi) =>
      assert(e <= eps, s"phi=$phi rank error $e > $eps")
    }
  }

  test("window cover succeeds at every period boundary (8 sub-windows)") {
    val rnd = new scala.util.Random(62)
    val pol = new ArasuManku(800, 100, Array(0.5), 0.05)
    val data = Array.fill(4000)(rnd.nextDouble() * 100)
    var evals = 0
    data.zipWithIndex.foreach { case (v, i) =>
      pol.insert(v)
      if ((i + 1) % 100 == 0 && i + 1 >= 800) { pol.evaluate(); evals += 1 }
    }
    assert(evals == (4000 - 800) / 100 + 1)
  }

  test("non-power-of-two sub-window counts are covered correctly") {
    val rnd = new scala.util.Random(63)
    val pol = new ArasuManku(600, 100, Array(0.5), 0.05) // n = 6
    val data = Array.fill(2400)(rnd.nextDouble() * 100)
    data.zipWithIndex.foreach { case (v, i) =>
      pol.insert(v)
      if ((i + 1) % 100 == 0 && i + 1 >= 600) pol.evaluate()
    }
    succeed
  }

  test("expired data stops influencing results") {
    val pol = new ArasuManku(400, 100, Array(0.5), 0.05)
    (1 to 400).foreach(_ => pol.insert(1000.0))
    assert(pol.evaluate()(0) == 1000.0)
    (1 to 400).foreach(_ => pol.insert(5.0))
    assert(pol.evaluate()(0) == 5.0)
  }

  test("evaluate off a period boundary or before a full window fails") {
    val pol = new ArasuManku(400, 100, Array(0.5), 0.05)
    (1 to 350).foreach(i => pol.insert(i.toDouble))
    intercept[IllegalArgumentException](pol.evaluate())
  }

  test("uses multiple levels and more space than single-resolution CMQS") {
    val rnd = new scala.util.Random(64)
    val am = new ArasuManku(4000, 500, phis, 0.02)
    val cm = new Cmqs(4000, 500, phis, 0.02)
    (1 to 4000).foreach { _ =>
      val v = rnd.nextDouble() * 1000
      am.insert(v); cm.insert(v)
    }
    assert(am.observedSpace > cm.observedSpace,
      s"AM ${am.observedSpace} should exceed CMQS ${cm.observedSpace}")
  }

  test("tumbling configuration (N = P) works") {
    val pol = new ArasuManku(500, 500, Array(0.5), 0.05)
    (1 to 500).foreach(i => pol.insert(i.toDouble))
    val v = pol.evaluate()(0)
    assert(math.abs(v - 250.0) <= 0.05 * 500 + 1)
  }
}
