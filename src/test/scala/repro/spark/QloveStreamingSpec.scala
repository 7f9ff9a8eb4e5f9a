package repro.spark

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec
import repro.core.{FewKConfig, Qlove}
import repro.data.Telemetry

class QloveStreamingSpec extends SparkSpec {
  private val phis = Array(0.5, 0.99)

  private def driverEstimates(data: Array[Double], n: Long, p: Long,
                              cfg: FewKConfig): Map[Long, Array[Double]] = {
    val op = new Qlove(n, p, phis, cfg)
    val out = scala.collection.mutable.Map.empty[Long, Array[Double]]
    data.zipWithIndex.foreach { case (v, i) =>
      op.insert(v)
      if ((i + 1) % p == 0 && op.windowFull)
        out((i + 1) / p - 1) = op.evaluate()
    }
    out.toMap
  }

  /** Run the streaming operator over `data` fed in `chunks` micro-batches
    * and collect every emitted evaluation.
    */
  private def runStreaming(data: Array[Double], n: Long, p: Long,
                           cfg: FewKConfig, chunks: Int,
                           shuffleWithinBatch: Boolean = false): Map[Long, Seq[Double]] = {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val source = MemoryStream[TelemetryEvent]
    val out = QloveStreaming.attach(spark, source.toDS(), n, p, cfg)
    val sink = new scala.collection.mutable.HashMap[Long, Seq[Double]]
    val query = out.writeStream.outputMode("append").foreachBatch {
      (batch: org.apache.spark.sql.Dataset[EvalEstimate], _: Long) =>
        batch.collect().foreach(e => sink.synchronized { sink(e.eval) = e.estimates })
    }.start()
    val events = data.zipWithIndex.map { case (v, i) => TelemetryEvent(i.toLong, v) }
    val rnd = new scala.util.Random(99)
    events.grouped(math.max(1, events.length / chunks)).foreach { chunk =>
      val batch = if (shuffleWithinBatch) rnd.shuffle(chunk.toSeq) else chunk.toSeq
      source.addData(batch)
      query.processAllAvailable()
    }
    query.stop()
    sink.toMap
  }

  test("streaming operator equals the driver operator across micro-batches") {
    val data = Telemetry.netmon(8000).toArray
    val cfg = FewKConfig.disabled(phis)
    val want = driverEstimates(data, 2048, 512, cfg)
    val got = runStreaming(data, 2048, 512, cfg, chunks = 7)
    assert(got.keySet == want.keySet)
    got.foreach { case (eval, est) =>
      assert(est == want(eval).toSeq, s"eval $eval")
    }
  }

  test("intra-batch event order does not matter (reorder buffer)") {
    val data = Telemetry.netmon(4096).toArray
    val cfg = FewKConfig.disabled(phis)
    val want = driverEstimates(data, 1024, 512, cfg)
    val got = runStreaming(data, 1024, 512, cfg, chunks = 4, shuffleWithinBatch = true)
    assert(got.keySet == want.keySet)
    got.foreach { case (eval, est) => assert(est == want(eval).toSeq, s"eval $eval") }
  }

  test("few-k configuration flows through the streaming state") {
    val base = Telemetry.netmon(6000).toArray
    val data = Telemetry.injectBurst(base, 1024, 256, 0.99)
    val cfg = FewKConfig.sampleOnly(1024, phis, 0.5)
    val want = driverEstimates(data, 1024, 256, cfg)
    val got = runStreaming(data, 1024, 256, cfg, chunks = 5)
    assert(got.keySet == want.keySet)
    got.foreach { case (eval, est) => assert(est == want(eval).toSeq, s"eval $eval") }
  }

  test("one evaluation per period once the window is full") {
    val data = Telemetry.netmon(5120).toArray
    val got = runStreaming(data, 1024, 512, FewKConfig.disabled(phis), chunks = 3)
    // subs 0..9; first full window ends at sub 1 -> evals 1..9
    assert(got.keySet == (1L to 9L).toSet)
  }
}
