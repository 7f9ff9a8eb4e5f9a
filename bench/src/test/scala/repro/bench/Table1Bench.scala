package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{PaperNumbers, Tables}

/** Table 1 — accuracy and space of the five policies on NetMon
  * (N=128K, P=16K, ε=0.02, Moment K=12). Prints measured rows next to the
  * paper's and asserts the table's shape claims.
  */
class Table1Bench extends AnyFunSuite {
  private lazy val rows = Tables.table1()
  private def row(p: String) = rows.find(_.policy == p).get
  private val i999 = Tables.Phis.indexOf(0.999)

  test("print Table 1 (measured vs paper)") {
    println("== Table 1 (measured) ==")
    println(Tables.renderTable1(rows))
    println("== Table 1 (paper) ==")
    Seq("QLOVE", "CMQS", "AM", "Random", "Moment").foreach { p =>
      val (re, ve, as_, os) = PaperNumbers.table1(p)
      println(f"$p%-8s | rank=${re.mkString(", ")} | value%%=${ve.mkString(", ")} | analytical=$as_ observed=$os")
    }
    succeed
  }

  test("all rank-bounded policies keep rank error within epsilon = 0.02") {
    Seq("QLOVE", "CMQS", "AM", "Random").foreach { p =>
      row(p).rankError.foreach(e => assert(e <= Tables.Epsilon, s"$p rank error $e"))
    }
  }

  test("QLOVE has the lowest Q0.999 value error of all policies") {
    val q = row("QLOVE").valueErrorPct(i999)
    Seq("CMQS", "AM", "Random", "Moment").foreach { p =>
      assert(q < row(p).valueErrorPct(i999),
        s"QLOVE $q%% should beat $p ${row(p).valueErrorPct(i999)}%%")
    }
  }

  test("QLOVE Q0.999 value error is within the paper's ~5% regime") {
    assert(row("QLOVE").valueErrorPct(i999) < 8.0)
  }

  test("rank-bounded competitors have large tail value errors (paper: 9-29%)") {
    Seq("CMQS", "AM", "Random").foreach { p =>
      assert(row(p).valueErrorPct(i999) > 5.0,
        s"$p Q0.999 error ${row(p).valueErrorPct(i999)}%% should be large")
    }
  }

  test("non-high quantile value errors are below 1% for every policy but Moment") {
    Seq("QLOVE", "CMQS", "AM", "Random").foreach { p =>
      assert(row(p).valueErrorPct(0) < 1.0, s"$p Q0.5")
      assert(row(p).valueErrorPct(1) < 1.0, s"$p Q0.9")
    }
  }

  test("QLOVE observed space undercuts its analytical bound via redundancy") {
    val r = row("QLOVE")
    assert(r.observedSpace < r.analyticalSpace,
      s"observed ${r.observedSpace} vs analytical ${r.analyticalSpace}")
  }

  test("QLOVE observed space undercuts Random's observed space") {
    // The paper's QLOVE also undercuts CMQS/AM observed space; our GK-based
    // CMQS/AM cores compress NetMon's duplicate-dense stream harder than the
    // authors' implementation did, so that comparison is recorded in
    // EXPERIMENTS.md rather than asserted here.
    assert(row("QLOVE").observedSpace < row("Random").observedSpace)
  }

  test("AM uses more space than CMQS (multi-level structure)") {
    assert(row("AM").observedSpace > row("CMQS").observedSpace)
  }
}
