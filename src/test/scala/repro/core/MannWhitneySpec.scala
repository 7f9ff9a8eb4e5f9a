package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MannWhitneySpec extends AnyFunSuite {
  private val rnd = new scala.util.Random(17)
  private def normal(n: Int, mean: Double, sd: Double): Array[Double] =
    Array.fill(n)(mean + sd * rnd.nextGaussian())

  test("identical samples are not stochastically larger") {
    val x = (1 to 50).map(_.toDouble).toArray
    assert(!MannWhitney.isStochasticallyLarger(x, x.clone()))
    assert(MannWhitney.pValueGreater(x, x.clone()) > 0.4)
  }

  test("clearly shifted-up sample is detected") {
    val y = normal(50, 100, 5)
    val x = y.map(_ * 10)
    assert(MannWhitney.isStochasticallyLarger(x, y))
    assert(MannWhitney.pValueGreater(x, y) < 1e-6)
  }

  test("shifted-down sample is not flagged (one-sided)") {
    val y = normal(50, 100, 5)
    val x = y.map(_ / 10)
    assert(!MannWhitney.isStochasticallyLarger(x, y))
    assert(MannWhitney.pValueGreater(x, y) > 0.5)
  }

  test("small samples never trigger") {
    assert(MannWhitney.pValueGreater(Array(1e9, 2e9), Array(1.0, 2.0)) == 1.0)
    assert(MannWhitney.pValueGreater(Array(1e9, 2e9, 3e9), Array(1.0, 2.0)) == 1.0)
  }

  test("all-ties sample yields p = 1") {
    val x = Array.fill(20)(5.0)
    assert(MannWhitney.pValueGreater(x, x.clone()) == 1.0)
  }

  test("heavy ties with a genuine shift still detect") {
    val y = Array.fill(40)(100.0) ++ Array.fill(10)(200.0)
    val x = Array.fill(40)(100.0) ++ Array.fill(10)(2000.0) ++ Array.fill(10)(5000.0)
    assert(MannWhitney.isStochasticallyLarger(x, y))
  }

  test("modest same-distribution noise stays below significance most of the time") {
    var flags = 0
    (1 to 100).foreach { _ =>
      val x = normal(30, 50, 10)
      val y = normal(30, 50, 10)
      if (MannWhitney.isStochasticallyLarger(x, y)) flags += 1
    }
    // one-sided alpha=0.05 -> expect ~5 false positives out of 100
    assert(flags < 15, s"false positive rate too high: $flags/100")
  }

  test("p-value approximates the known small-sample case") {
    // x = {3,4,5}, y = {1,2} -> U = 6 (all pairs x>y), strongly one-sided
    val p = MannWhitney.pValueGreater(Array(3.0, 4.0, 5.0, 6.0), Array(1.0, 2.0, 2.5))
    assert(p < 0.1, s"p=$p")
  }

  test("10x burst over a NetMon-like tail pool is detected") {
    val pool = Array.fill(50)(1500.0 + rnd.nextDouble() * 500)
    val burst = pool.map(_ * 10)
    assert(MannWhitney.isStochasticallyLarger(burst, pool))
    assert(!MannWhitney.isStochasticallyLarger(pool, burst))
  }
}
