package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{PaperNumbers, Tables}

/** Table 4 — sample-k merging under injected bursts (10× the top N(1-0.999)
  * values of every (N/P)-th sub-window, one burst per window evaluation).
  * Shape claims: without sampling (fraction 0) Q0.999 error explodes;
  * fraction 0.5 recovers to ~1-2%; fraction 0.1 helps but is insufficient
  * for Q0.999 while already fixing Q0.99.
  */
class Table4Bench extends AnyFunSuite {
  private lazy val res = Tables.table4()

  test("print Table 4 (measured vs paper)") {
    println("== Table 4 (measured: Q0.99 / Q0.999 err %, (sample space)) ==")
    println(Tables.renderTable4(res))
    println("== Table 4 (paper) ==")
    Tables.Table4Fractions.foreach { f =>
      val cells = Tables.Table4Periods.map { p =>
        val (e99, e999, s) = PaperNumbers.table4((f, p))
        f"$e99%.2f%% / $e999%.2f%% ($s)"
      }
      println(f"$f%-4s | ${cells.mkString(" | ")}")
    }
    succeed
  }

  test("bursts wreck Q0.999 without sampling (fraction 0)") {
    Tables.Table4Periods.foreach { p =>
      val e = res((0.0, p)).q999ErrPct
      assert(e > 10.0, s"period $p: $e% (paper: 44-55%)")
      assert(e > 5 * res((0.5, p)).q999ErrPct, s"period $p: no-sampling error " +
        s"$e% should dwarf the fraction-0.5 error ${res((0.5, p)).q999ErrPct}%")
    }
  }

  test("the smaller period is hit harder by the burst at Q0.99") {
    // paper: 0.08% at 16K vs 28.15% at 4K — the burst's 132 values sweep past
    // the Q0.99 reference depth only when sub-windows are small
    val e16 = res((0.0, 16384L)).q99ErrPct
    val e4 = res((0.0, 4096L)).q99ErrPct
    assert(e4 > e16, s"4K $e4% should exceed 16K $e16%")
  }

  test("fraction 0.5 recovers Q0.999 to a few percent") {
    Tables.Table4Periods.foreach { p =>
      val e = res((0.5, p)).q999ErrPct
      assert(e < 5.0, s"period $p: $e% (paper: 1.5-1.8%)")
      assert(e < res((0.0, p)).q999ErrPct / 3, s"period $p insufficient recovery")
    }
  }

  test("fraction 0.1 already fixes Q0.99") {
    Tables.Table4Periods.foreach { p =>
      val e = res((0.1, p)).q99ErrPct
      assert(e < 3.0, s"period $p: $e% (paper: 0.14-0.43%)")
    }
  }

  test("Q0.999 needs the higher sampling rate (0.1 insufficient, 0.5 enough)") {
    Tables.Table4Periods.foreach { p =>
      assert(res((0.5, p)).q999ErrPct < res((0.1, p)).q999ErrPct, s"period $p")
    }
  }

  test("sample space is zero at fraction 0 and grows with the fraction") {
    Tables.Table4Periods.foreach { p =>
      assert(res((0.0, p)).fewkSpace == 0)
      assert(res((0.5, p)).fewkSpace > res((0.1, p)).fewkSpace, s"period $p")
    }
  }
}
