package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.core.FewKConfig
import repro.data.Telemetry
import repro.harness.Tables
import repro.spark.{QloveStreaming, TelemetryEvent}

/** QLOVE as a live Structured Streaming query: feeds the NetMon-like stream
  * through the `flatMapGroupsWithState` operator in micro-batches and prints
  * each emitted window evaluation (the streaming counterpart of Q_monitor).
  */
object StreamingQuantiles {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qlove-streaming").getOrCreate()
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val n = math.min(Tables.defaultEvents, 512L * 1024L)
    val windowN = Tables.WindowN
    val periodP = Tables.PeriodP
    val source = MemoryStream[TelemetryEvent]
    val out = QloveStreaming.attach(spark, source.toDS(), windowN, periodP,
      FewKConfig.disabled(Tables.Phis))
    val query = out.writeStream.outputMode("append").format("console")
      .option("numRows", 200).start()
    val it = Telemetry.netmon(n)
    val batchSize = periodP.toInt
    it.grouped(batchSize).zipWithIndex.foreach { case (chunk, i) =>
      source.addData(chunk.zipWithIndex.map { case (v, j) =>
        TelemetryEvent(i.toLong * batchSize + j, v)
      })
      query.processAllAvailable()
    }
    query.stop()
    spark.stop()
  }
}
