package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle
  * end-to-end (the graph benches use the oracle through SparkGraphOps;
  * this pins the generic result-equality path as well).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).count()
    val b = SynthData.lineitem(spark, sf = 0.001).count()
    assert(a == b && a == 6000)
  }

  test("orders keys are dense 1..N") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.count() == 1500)
    val row = o.agg(min("o_orderkey").as("mn"), max("o_orderkey").as("mx")).collect()(0)
    assert(row.getLong(0) == 1L && row.getLong(1) == 1500L)
  }

  test("oracle-checked aggregation over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).select(
      col("l_returnflag"), col("l_quantity").cast("long").as("l_quantity"))
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), sum("l_quantity").as("qty"))
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag, count(*) AS cnt, sum(CAST(l_quantity AS BIGINT)) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle-checked join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_orderkey", "o_custkey")
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey", "c_nationkey")
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_nationkey").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT c_nationkey, count(*) AS cnt
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_nationkey""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(topZ > topU * 3, s"zipf top=$topZ uniform top=$topU")
  }
}
