package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators + DuckDB oracle.
  * (The paper under reproduction is a graph-mining paper; these generators
  * are part of the shared scaffold and are kept working.)
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates deterministic row counts per scale factor") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000)
    assert(li.columns.contains("l_orderkey"))
  }

  test("aggregate over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    // floor before summing: float addition order differs between engines
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"),
        sum(floor(col("l_quantity"))).cast("long").as("sum_qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       CAST(SUM(FLOOR(CAST(l_quantity AS DOUBLE))) AS BIGINT) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders joins lineitem consistently with DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val j = li.join(o, col("l_orderkey") === col("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      j,
      """SELECT o_orderstatus, COUNT(*) AS cnt
        |FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> o)
  }

  test("zipf keys are heavily skewed toward low ranks") {
    val df = SynthData.zipfKeys(spark, 20000, 1000).cache()
    val top = df.where(col("k") <= 10).count()
    assert(top > df.count() / 4, s"top-10 keys only cover $top rows")
  }

  test("uniform keys cover the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, 20000, 100)
    val mx = df.groupBy("k").count().agg(max("count")).head().getLong(0)
    assert(mx < 600, s"max bucket $mx")
  }
}
