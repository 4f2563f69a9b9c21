package repro.data

import repro.{Oracle, SparkSpec, SynthData}

/** Sanity coverage for the provided TPC-H-lite generators: deterministic in
  * (sf, seed), and Spark aggregates over them agree with DuckDB.
  */
class SynthDataOracleSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1).agg(sum("l_quantity")).head.getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1).agg(sum("l_quantity")).head.getDouble(0)
    assert(a == b)
  }

  test("lineitem group-by aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_quantity")
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    val sql =
      """SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin
    Oracle.assertEquivalent(got, sql, "lineitem" -> li)
  }

  test("orders join customer row-count matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002).select("o_orderkey", "o_custkey")
    val c = SynthData.customer(spark, sf = 0.002).select("c_custkey", "c_nationkey")
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_nationkey").agg(count(lit(1)).as("cnt"))
    val sql =
      """SELECT c_nationkey, COUNT(*) AS cnt
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |GROUP BY c_nationkey""".stripMargin
    Oracle.assertEquivalent(got, sql, "orders" -> o, "customer" -> c)
  }

  test("zipfKeys is skewed: the hottest key dominates a uniform draw") {
    val zipf = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, seed = 5)
    val uni = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000, seed = 5)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().orderBy(desc("count")).head.getLong(1).toDouble / 20000.0
    assert(topShare(zipf) > 5 * topShare(uni), "zipf top key should dominate")
  }
}
