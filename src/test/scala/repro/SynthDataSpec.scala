package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators (kept exercised even
  * though the Peregrine evaluation runs on graphs) plus an Oracle check.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates deterministic rows at tiny scale") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000)
    assert(li.columns.contains("l_extendedprice"))
  }

  test("orders/customer/part generate at tiny scale") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("aggregation over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val agg = li
      .groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt")
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, CAST(count(*) AS BIGINT) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li
    )
    li.unpersist()
  }

  test("zipf keys are skewed relative to uniform keys") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val topZ = z.groupBy("k").count().agg(max("count")).head().getLong(0)
    val topU = u.groupBy("k").count().agg(max("count")).head().getLong(0)
    assert(topZ > topU)
  }
}
