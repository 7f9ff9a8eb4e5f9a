package repro

import org.apache.spark.sql.functions._
import repro.data.Telemetry

class SynthDataSpec extends SparkSpec {

  test("lineitem aggregate matches DuckDB (Oracle, TPC-H-lite pricing query)") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li
      .groupBy("l_returnflag", "l_linestatus")
      .agg(
        count(lit(1)).as("cnt"),
        round(sum(col("l_quantity")), 2).as("sum_qty"),
        round(sum(col("l_extendedprice")), 2).as("sum_price"))
      .select("l_returnflag", "l_linestatus", "cnt", "sum_qty", "sum_price")
    Oracle.assertEquivalent(got,
      """SELECT l_returnflag, l_linestatus, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty,
        |       ROUND(SUM(CAST(l_extendedprice AS DOUBLE)), 2) AS sum_price
        |FROM lineitem GROUP BY 1, 2""".stripMargin,
      "lineitem" -> li)
  }

  test("orders join customer matches DuckDB (Oracle, shuffle-join path)") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("cnt"))
      .select("c_mktsegment", "cnt")
    Oracle.assertEquivalent(got,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY 1""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("netmonEvents equals the driver-side generator bit-for-bit") {
    val df = SynthData.netmonEvents(spark, 2000, seed = 7).orderBy("seq").collect()
    val driver = Telemetry.netmon(2000, 7).toArray
    df.foreach(r => assert(r.getDouble(1) == driver(r.getLong(0).toInt)))
  }

  test("paretoEvents and searchEvents are deterministic and in-range") {
    val p = SynthData.paretoEvents(spark, 1000).agg(min("value"), max("value")).head()
    assert(p.getDouble(0) >= 10.0 && p.getDouble(1) <= 1.1e9)
    val s1 = SynthData.searchEvents(spark, 500).collect().map(_.getDouble(1)).toSeq
    val s2 = SynthData.searchEvents(spark, 500).collect().map(_.getDouble(1)).toSeq
    assert(s1 == s2)
    assert(s1.max <= 200000.0)
  }

  test("normalEvents matches the driver normal generator's moments") {
    val stats = SynthData.normalEvents(spark, 50000)
      .agg(avg("value").as("m"), stddev_pop("value").as("s")).head()
    assert(math.abs(stats.getDouble(0) - 1e6) < 2000)
    assert(math.abs(stats.getDouble(1) - 5e4) / 5e4 < 0.05)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).head().getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).head().getLong(1)
    assert(z > 3 * u, s"zipf top key $z should dominate uniform top key $u")
  }
}
