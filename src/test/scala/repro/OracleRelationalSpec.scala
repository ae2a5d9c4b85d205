package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators + DuckDB oracle, exercised on the
  * relational query shapes the reproduction relies on (group-aggregate,
  * top-L ranking, join-filter) — guards the oracle harness itself and the
  * DataFrame idioms used across the graph dataflows.
  */
class OracleRelationalSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.002).cache()

  test("oracle: group-by aggregate (TPC-H Q1 shape)") {
    val q = li.groupBy("l_returnflag", "l_linestatus")
      .agg(
        round(sum(col("l_quantity")), 2).as("sum_qty"),
        count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag, l_linestatus,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty,
        |       CAST(count(*) AS BIGINT) AS cnt
        |FROM lineitem GROUP BY l_returnflag, l_linestatus""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle: top-L by aggregate score (the TopL-ICDE ranking shape)") {
    val q = li.groupBy("l_orderkey")
      .agg(round(sum(col("l_extendedprice") * (lit(1) - col("l_discount"))), 4).as("revenue"))
      .orderBy(col("revenue").desc, col("l_orderkey"))
      .limit(5)
    Oracle.assertEquivalent(
      q,
      """SELECT l_orderkey,
        |       ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 4) AS revenue
        |FROM lineitem GROUP BY l_orderkey
        |ORDER BY revenue DESC, CAST(l_orderkey AS BIGINT) LIMIT 5""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle: join + filter (the eligibility-filter shape)") {
    val q = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .where(col("o_orderstatus") === "F")
      .agg(count(lit(1)).as("cnt"), round(sum(col("l_quantity")), 2).as("qty"))
    Oracle.assertEquivalent(
      q,
      """SELECT CAST(count(*) AS BIGINT) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
        |WHERE o.o_orderstatus = 'F'""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("oracle: zipf key generator is skewed and matches DuckDB counts") {
    val z = SynthData.zipfKeys(spark, 20000, 100).groupBy("k").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      z,
      "SELECT k, CAST(count(*) AS BIGINT) AS cnt FROM zk GROUP BY k",
      "zk" -> SynthData.zipfKeys(spark, 20000, 100))
    val head = z.where(col("k") === 1).collect()(0).getLong(1)
    val tail = z.where(col("k") === 50).collect().headOption.map(_.getLong(1)).getOrElse(0L)
    assert(head > tail)
  }
}
