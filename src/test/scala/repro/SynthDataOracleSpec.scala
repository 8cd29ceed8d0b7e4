package repro

import org.apache.spark.sql.functions._

/** Plumbing checks for the provided TPC-H-lite generators and the DuckDB
  * oracle — every relational result is verified against DuckDB.
  */
class SynthDataOracleSpec extends SparkSpec {

  private val sf = 0.001

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf).agg(sum("l_quantity")).head().getDouble(0)
    val b = SynthData.lineitem(spark, sf).agg(sum("l_quantity")).head().getDouble(0)
    assert(a == b)
  }

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf).count() == 6000L)
  }

  test("group-by returnflag matches DuckDB") {
    val li = SynthData.lineitem(spark, sf).cache()
    val q = li.groupBy("l_returnflag").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
    li.unpersist()
  }

  test("orders/customer join count matches DuckDB") {
    val o = SynthData.orders(spark, sf).cache()
    val c = SynthData.customer(spark, sf).cache()
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT c_mktsegment, count(*) AS cnt
        |FROM orders JOIN customer ON orders.o_custkey = customer.c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
    o.unpersist(); c.unpersist()
  }

  test("zipfKeys is skewed: top key far exceeds the median key frequency") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, seed = 3)
    val freqs = df.groupBy("k").count().orderBy(desc("count"))
      .limit(10).collect().map(_.getLong(1))
    val total = 20000.0
    assert(freqs.head / total > 0.05, s"top key freq ${freqs.head} not skewed")
  }

  test("uniformKeys covers the key range roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 10000, nKeys = 10, seed = 4)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.max < 3 * counts.min, "uniform keys should be balanced")
  }

  test("part table prices are deterministic per key") {
    val p = SynthData.part(spark, sf).cache()
    val q = p.groupBy("p_type").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      "SELECT p_type, count(*) AS cnt FROM part GROUP BY p_type",
      "part" -> p)
    p.unpersist()
  }
}
