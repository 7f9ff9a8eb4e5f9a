package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{PaperNumbers, Tables}

/** Table 4 — sample-k merging under injected 10× bursts on the top
  * N(1-0.999) values of every (N/P)-th sub-window (128K window, NetMon-like).
  */
object Table4 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qlove-table4").getOrCreate()
    val res = Tables.table4(Tables.defaultEvents)
    println("== Table 4 (measured, err % Q0.99 / Q0.999, sample space) ==")
    println(Tables.renderTable4(res))
    println("== Table 4 (paper) ==")
    PaperNumbers.table4.toSeq.sortBy(k => (k._1._2, k._1._1)).foreach {
      case ((f, p), (e99, e999, space)) =>
        println(f"fraction=$f period=${p / 1024}K Q0.99=$e99%.2f%% Q0.999=$e999%.2f%% space=$space")
    }
    spark.stop()
  }
}
