package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{PaperNumbers, Tables}

/** Table 3 — top-k merging fraction sweep for exact-guarantee Q0.999 caching
  * (statistical inefficiency; 128K window, periods 8K..1K, NetMon-like).
  */
object Table3 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qlove-table3").getOrCreate()
    val res = Tables.table3(Tables.defaultEvents)
    println("== Table 3 (measured, Q0.999 err % and few-k space) ==")
    println(Tables.renderTable34(res, Tables.Table3Fractions, Tables.Table3Periods))
    println("== Table 3 (paper) ==")
    PaperNumbers.table3.toSeq.sortBy(k => (k._1._1, -k._1._2)).foreach {
      case ((f, p), (err, space)) => println(f"fraction=$f period=${p / 1024}K err=$err%.2f%% space=$space")
    }
    spark.stop()
  }
}
