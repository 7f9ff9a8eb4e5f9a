package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.harness.{PaperNumbers, Tables}

/** Table 2 — QLOVE value errors without few-k merging for period sizes 64K
  * down to 1K (128K window, NetMon-like stream).
  */
object Table2 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qlove-table2").getOrCreate()
    val n = Tables.defaultEvents
    SynthData.netmonEvents(spark, n).count() // materialize the distributed gen path
    val res = Tables.table2(n)
    println("== Table 2 (measured, value error %) ==")
    println(Tables.renderTable2(res))
    println("== Table 2 (paper) ==")
    println(Tables.renderTable2(PaperNumbers.table2))
    spark.stop()
  }
}
