package repro.spark

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.core.{FewKConfig, Qlove}
import repro.data.Telemetry

class QloveBatchSpec extends SparkSpec {
  private val phis = Array(0.5, 0.9, 0.99)

  /** Driver-side reference: run the sequential operator and key each
    * evaluation by its most recent sub-window index.
    */
  private def driverEstimates(data: Array[Double], n: Long, p: Long,
                              cfg: FewKConfig, digits: Int): Map[Long, Array[Double]] = {
    val op = new Qlove(n, p, phis, cfg, digits)
    val out = scala.collection.mutable.Map.empty[Long, Array[Double]]
    data.zipWithIndex.foreach { case (v, i) =>
      op.insert(v)
      if ((i + 1) % p == 0 && op.windowFull)
        out((i + 1) / p - 1) = op.evaluate()
    }
    out.toMap
  }

  private def toDf(data: Array[Double]) = {
    import spark.implicits._
    spark.sparkContext.parallelize(data.zipWithIndex.map { case (v, i) => (i.toLong, v) }, 8)
      .toDF("seq", "value")
  }

  private def check(data: Array[Double], n: Long, p: Long, cfg: FewKConfig,
                    digits: Int): Unit = {
    val want = driverEstimates(data, n, p, cfg, digits)
    val got = QloveBatch.estimates(spark, toDf(data), n, p, cfg, digits).collect()
    assert(got.length == want.size, s"${got.length} evals vs ${want.size}")
    got.foreach { e =>
      val w = want(e.eval)
      phis.indices.foreach { i =>
        val d = math.abs(e.estimates(i) - w(i))
        assert(d <= 1e-9 * math.max(1.0, math.abs(w(i))),
          s"eval ${e.eval} phi=${phis(i)}: spark ${e.estimates(i)} vs driver ${w(i)}")
      }
    }
  }

  test("batch pipeline equals the driver operator: plain Level-2") {
    val data = Telemetry.netmon(20000).toArray
    check(data, 4096, 1024, FewKConfig.disabled(phis), 3)
  }

  test("batch pipeline equals the driver operator: top-k merging") {
    val data = Telemetry.netmon(16000).toArray
    check(data, 2048, 256, FewKConfig.topOnly(2048, 256, phis, 0.5), 3)
  }

  test("batch pipeline equals the driver operator: sample-k with bursts") {
    val base = Telemetry.netmon(16000).toArray
    val data = Telemetry.injectBurst(base, 2048, 512, 0.99)
    check(data, 2048, 512, FewKConfig.sampleOnly(2048, phis, 0.5), 3)
  }

  test("batch pipeline equals the driver operator: no quantization") {
    val data = Telemetry.pareto(12000).toArray
    check(data, 2048, 1024, FewKConfig.disabled(phis), 0)
  }

  test("incomplete trailing sub-windows are dropped") {
    val data = Telemetry.netmon(4096 + 100).toArray // partial last sub-window
    val got = QloveBatch.estimates(spark, toDf(data), 2048, 1024,
      FewKConfig.disabled(phis)).collect()
    assert(got.length == (4096 - 2048) / 1024 + 1)
  }

  test("subWindowSummaries filters partial sub-windows and keys by index") {
    val data = Telemetry.netmon(3500).toArray
    val df = QloveBatch.subWindowSummaries(toDf(data), 1000, FewKConfig.disabled(phis))
    val subs = df.select("sub").collect().map(_.getLong(0)).sorted
    assert(subs.sameElements(Array(0L, 1L, 2L)))
    val counts = df.select(col("summary.count")).collect().map(_.getLong(0))
    assert(counts.forall(_ == 1000L))
  }

  test("evaluation ids are consecutive and start at n-1") {
    val data = Telemetry.netmon(10240).toArray
    val got = QloveBatch.estimates(spark, toDf(data), 2048, 512,
      FewKConfig.disabled(phis)).collect()
    val ids = got.map(_.eval)
    assert(ids.head == 3) // n = 4 sub-windows -> first full window ends at sub 3
    assert(ids.sameElements(ids.head to ids.last))
  }

  test("rejects misaligned window/period") {
    val data = Telemetry.netmon(2000).toArray
    intercept[IllegalArgumentException](
      QloveBatch.estimates(spark, toDf(data), 1000, 300, FewKConfig.disabled(phis)))
  }
}
