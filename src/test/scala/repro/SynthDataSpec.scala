package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB oracle
  * wiring (the FairDiv experiments use the geometric generators in
  * `repro.data`, but the shared infra must stay healthy).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates deterministic rows at tiny SF") {
    val a = SynthData.lineitem(spark, sf = 0.001).count()
    val b = SynthData.lineitem(spark, sf = 0.001).count()
    assert(a == b && a == 6000L)
  }

  test("orders/customer/part have expected keys") {
    assert(SynthData.orders(spark, 0.001).count() == 1500L)
    assert(SynthData.customer(spark, 0.001).count() == 150L)
    assert(SynthData.part(spark, 0.001).count() == 200L)
  }

  test("oracle validates a lineitem aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li.select(col("l_orderkey").cast("string"), col("l_returnflag")))
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(zTop > 3 * uTop, s"zipf top $zTop vs uniform top $uTop")
  }
}
