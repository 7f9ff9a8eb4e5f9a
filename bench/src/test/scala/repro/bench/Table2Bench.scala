package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{PaperNumbers, Tables}

/** Table 2 — QLOVE average relative value errors without few-k merging for
  * period sizes 64K..1K in a 128K window (NetMon). Shape claims: errors are
  * sub-1% for Q0.5/Q0.9 at every period, and Q0.999 error grows sharply as
  * the period shrinks (statistical inefficiency).
  */
class Table2Bench extends AnyFunSuite {
  private lazy val res = Tables.table2()
  private val i5 = 0; private val i9 = 1; private val i99 = 2; private val i999 = 3

  test("print Table 2 (measured vs paper)") {
    println("== Table 2 (measured, value error %) ==")
    println(Tables.renderTable2(res))
    println("== Table 2 (paper, value error %) ==")
    println(Tables.renderTable2(PaperNumbers.table2))
    succeed
  }

  test("Q0.5 and Q0.9 errors stay below 1% across all periods") {
    Tables.Table2Periods.foreach { p =>
      assert(res(p)(i5) < 1.0, s"period $p Q0.5 ${res(p)(i5)}%")
      assert(res(p)(i9) < 1.0, s"period $p Q0.9 ${res(p)(i9)}%")
    }
  }

  test("Q0.999 error at the smallest period is several times the largest period's") {
    val large = res(65536L)(i999)
    val small = res(1024L)(i999)
    assert(small > 2.0 * large, s"64K: $large%, 1K: $small%")
  }

  test("Q0.999 error exceeds the 5% NetMon target for small periods (paper: < 16K)") {
    assert(res(1024L)(i999) > 5.0, s"1K period: ${res(1024L)(i999)}%")
  }

  test("Q0.999 error trends upward as the period shrinks") {
    val seq = Tables.Table2Periods.map(res(_)(i999))
    // allow local noise but require the broad trend (ends + midpoint ordered)
    assert(seq.last > seq.head, s"trend violated: $seq")
    assert(seq(Tables.Table2Periods.length / 2) >= seq.head, s"trend violated: $seq")
  }

  test("Q0.99 error is always below Q0.999 error") {
    Tables.Table2Periods.foreach { p =>
      assert(res(p)(i99) < res(p)(i999), s"period $p")
    }
  }
}
