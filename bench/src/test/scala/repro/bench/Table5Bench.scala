package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{PaperNumbers, Tables}

/** Table 5 — non-i.i.d. robustness on AR(1) data with N(1e6, 5e4²)
  * marginals. Shape claims: all errors are tiny (1e-5..1e-3 as fractions),
  * growing only mildly with the correlation ψ, and growing with φ.
  */
class Table5Bench extends AnyFunSuite {
  private lazy val res = Tables.table5()

  test("print Table 5 (measured vs paper)") {
    println("== Table 5 (measured, error fractions) ==")
    println(Tables.renderTable5(res))
    println("== Table 5 (paper, error fractions) ==")
    println(Tables.renderTable5(PaperNumbers.table5))
    succeed
  }

  test("errors are tiny for every psi and quantile") {
    res.foreach { case (psi, errs) =>
      errs.zip(Tables.Table5Phis).foreach { case (e, phi) =>
        assert(e < 5e-3, s"psi=$psi phi=$phi error $e")
      }
    }
  }

  test("errors grow with the quantile (tail is less dense)") {
    res.foreach { case (psi, errs) =>
      assert(errs(0) < errs(2), s"psi=$psi: ${errs.toSeq}")
    }
  }

  test("high correlation (psi=0.8) degrades accuracy only mildly") {
    Tables.Table5Phis.indices.foreach { i =>
      val e0 = res(0.0)(i)
      val e8 = res(0.8)(i)
      assert(e8 < 10 * e0 + 1e-5, s"phi=${Tables.Table5Phis(i)}: $e0 -> $e8")
    }
  }

  test("low correlation (psi=0.2) is nearly indistinguishable from i.i.d.") {
    Tables.Table5Phis.indices.foreach { i =>
      val e0 = res(0.0)(i)
      val e2 = res(0.2)(i)
      assert(e2 < 3 * e0 + 1e-5, s"phi=${Tables.Table5Phis(i)}: $e0 -> $e2")
    }
  }

  test("errors are within an order of magnitude of the paper's") {
    res.foreach { case (psi, errs) =>
      val paper = PaperNumbers.table5(psi)
      Tables.Table5Phis.indices.foreach { i =>
        assert(errs(i) < 30 * paper(i), s"psi=$psi phi=${Tables.Table5Phis(i)}")
      }
    }
  }
}
