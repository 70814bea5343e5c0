package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators against the DuckDB
  * oracle — exercises the Spark SQL plumbing (aggregation, filter, join)
  * the repo's pipelines rely on.
  */
class OracleSynthSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.001).cache()

  test("group-by aggregation matches DuckDB") {
    val df = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 3).as("qty"))
      .select(col("l_returnflag"), col("cnt").cast("string").as("cnt"), col("qty"))
    Oracle.assertEquivalent(df,
      """SELECT l_returnflag, CAST(COUNT(*) AS VARCHAR) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 3) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("filter + projection matches DuckDB") {
    val df = li.filter(col("l_discount") > 0.05)
      .groupBy("l_linestatus").agg(count(lit(1)).cast("string").as("cnt"))
    Oracle.assertEquivalent(df,
      """SELECT l_linestatus, CAST(COUNT(*) AS VARCHAR) AS cnt
        |FROM lineitem WHERE CAST(l_discount AS DOUBLE) > 0.05
        |GROUP BY l_linestatus""".stripMargin,
      "lineitem" -> li)
  }

  test("join + aggregation matches DuckDB") {
    val df = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).cast("string").as("cnt"))
    Oracle.assertEquivalent(df,
      """SELECT o_orderstatus, CAST(COUNT(*) AS VARCHAR) AS cnt
        |FROM lineitem JOIN orders ON lineitem.l_orderkey = orders.o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }
}
