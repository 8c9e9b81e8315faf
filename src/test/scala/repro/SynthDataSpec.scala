package repro

import org.apache.spark.sql.functions._

/** Sanity checks over the provided TPC-H-lite generators and the DuckDB
  * oracle harness itself (the perception substrate has its own suite).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }
  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }
  test("oracle: grouped aggregate over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val agg = li.groupBy("l_returnflag").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }
  test("oracle: join cardinality matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val agg = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      agg,
      "SELECT c_mktsegment, COUNT(*) AS n FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT) GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }
  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
    val zTop = z.orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val uTop = u.orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(zTop > uTop * 3)
  }
}
