package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Stat

class ExactSlidingSpec extends AnyFunSuite {
  private val phis = Array(0.1, 0.5, 0.9, 0.99)

  test("matches sort-based quantiles over the most recent window (property)") {
    val rnd = new scala.util.Random(31)
    val pol = new ExactSliding(500, phis)
    val data = Array.fill(3000)(rnd.nextInt(80).toDouble)
    data.zipWithIndex.foreach { case (v, i) =>
      pol.insert(v)
      if (i >= 499 && (i + 1) % 250 == 0) {
        val window = data.slice(i - 499, i + 1)
        val want = phis.map(Stat.exactQuantile(window, _))
        assert(pol.evaluate().sameElements(want), s"at element ${i + 1}")
      }
    }
  }

  test("evaluate on a partially filled window fails") {
    val pol = new ExactSliding(100, phis)
    (1 to 50).foreach(i => pol.insert(i.toDouble))
    intercept[IllegalArgumentException](pol.evaluate())
  }

  test("expired elements stop influencing results") {
    val pol = new ExactSliding(10, Array(0.5))
    (1 to 10).foreach(_ => pol.insert(1000.0))
    assert(pol.evaluate()(0) == 1000.0)
    (1 to 10).foreach(_ => pol.insert(5.0))
    assert(pol.evaluate()(0) == 5.0)
  }

  test("rankInterval reflects the live window") {
    val pol = new ExactSliding(4, Array(0.5))
    Seq(1.0, 2.0, 2.0, 9.0).foreach(pol.insert)
    assert(pol.rankInterval(2.0) == (2L, 3L))
    pol.insert(2.0) // evicts the 1.0
    assert(pol.rankInterval(2.0) == (1L, 3L))
  }

  test("space shrinks with duplicates but ring buffer dominates") {
    val dup = new ExactSliding(1000, phis)
    (1 to 1000).foreach(_ => dup.insert(7.0))
    assert(dup.observedSpace == 1000 + 2) // ring + one tree node
    val uniq = new ExactSliding(1000, phis)
    (1 to 1000).foreach(i => uniq.insert(i.toDouble))
    assert(uniq.observedSpace == 1000 + 2000)
  }

  test("analyticalSpace is 3N") {
    assert(new ExactSliding(1000, phis).analyticalSpace == 3000)
  }
}
