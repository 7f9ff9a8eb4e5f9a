package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{PaperNumbers, Tables}

/** Table 5 — non-i.i.d. robustness: AR(1) streams with ψ ∈ {0, 0.2, 0.8}
  * and N(1e6, 5e4²) marginals (128K window, 16K period).
  */
object Table5 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qlove-table5").getOrCreate()
    val res = Tables.table5(Tables.defaultEvents)
    println("== Table 5 (measured, error fractions) ==")
    println(Tables.renderTable5(res))
    println("== Table 5 (paper) ==")
    println(Tables.renderTable5(PaperNumbers.table5))
    spark.stop()
  }
}
