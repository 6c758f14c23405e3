package repro.workloads

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.SynthData

/** TPC-H-lite query suite (paper Table 2 "SQL" class / Fig 21) over the
  * SynthData schema (lineitem, orders, customer, part).
  *
  * Each query returns the Spark DataFrame and the DuckDB SQL that must
  * produce identical rows (the SynthData tables are registered as VARCHAR in
  * DuckDB, hence the CASTs). Money sums are rounded to whole units:
  * the different summation orders of the two engines drift at ~1e-1 absolute
  * on these magnitudes, far below the rounding step.
  */
object TpchQueries {

  final case class Tpch(spark: SparkSession, sf: Double, seed: Long = 0) {
    val lineitem: DataFrame = SynthData.lineitem(spark, sf)
    val orders: DataFrame   = SynthData.orders(spark, sf)
    val customer: DataFrame = SynthData.customer(spark, sf)
    val part: DataFrame     = SynthData.part(spark, sf)
  }

  final case class Query(name: String, spark: DataFrame, duckSql: String,
                         tables: Seq[String])

  /** Q1: pricing summary report (full aggregation over lineitem). */
  def q1(t: Tpch): Query = Query(
    "Q1",
    t.lineitem
      .where(col("l_shipdate") <= lit("1998-09-01"))
      .groupBy("l_returnflag", "l_linestatus")
      .agg(
        round(sum("l_quantity"), 0) as "sum_qty",
        round(sum("l_extendedprice"), 0) as "sum_base_price",
        round(sum(col("l_extendedprice") * (lit(1) - col("l_discount"))), 0) as "sum_disc_price",
        round(avg("l_quantity"), 4) as "avg_qty",
        count(lit(1)) as "count_order"),
    """SELECT l_returnflag, l_linestatus,
      |  ROUND(SUM(CAST(l_quantity AS DOUBLE)), 0) AS sum_qty,
      |  ROUND(SUM(CAST(l_extendedprice AS DOUBLE)), 0) AS sum_base_price,
      |  ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 0) AS sum_disc_price,
      |  ROUND(AVG(CAST(l_quantity AS DOUBLE)), 4) AS avg_qty,
      |  COUNT(*) AS count_order
      |FROM lineitem WHERE l_shipdate <= '1998-09-01'
      |GROUP BY l_returnflag, l_linestatus""".stripMargin,
    Seq("lineitem"))

  /** Q3-lite: revenue per market segment for pre-1995 orders shipped later. */
  def q3(t: Tpch): Query = Query(
    "Q3",
    t.customer
      .join(t.orders, col("c_custkey") === col("o_custkey"))
      .join(t.lineitem, col("o_orderkey") === col("l_orderkey"))
      .where(col("o_orderdate") < lit("1995-03-15") && col("l_shipdate") > lit("1995-03-15"))
      .groupBy("c_mktsegment")
      .agg(round(sum(col("l_extendedprice") * (lit(1) - col("l_discount"))), 0) as "revenue",
           count(lit(1)) as "cnt"),
    """SELECT c_mktsegment,
      |  ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 0) AS revenue,
      |  COUNT(*) AS cnt
      |FROM customer JOIN orders ON c_custkey = o_custkey
      |              JOIN lineitem ON o_orderkey = l_orderkey
      |WHERE o_orderdate < '1995-03-15' AND l_shipdate > '1995-03-15'
      |GROUP BY c_mktsegment""".stripMargin,
    Seq("customer", "orders", "lineitem"))

  /** Q5-lite: 1994 revenue per customer nation. */
  def q5(t: Tpch): Query = Query(
    "Q5",
    t.customer
      .join(t.orders, col("c_custkey") === col("o_custkey"))
      .join(t.lineitem, col("o_orderkey") === col("l_orderkey"))
      .where(col("o_orderdate") >= lit("1994-01-01") && col("o_orderdate") < lit("1995-01-01"))
      .groupBy("c_nationkey")
      .agg(round(sum(col("l_extendedprice") * (lit(1) - col("l_discount"))), 0) as "revenue"),
    """SELECT c_nationkey,
      |  ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 0) AS revenue
      |FROM customer JOIN orders ON c_custkey = o_custkey
      |              JOIN lineitem ON o_orderkey = l_orderkey
      |WHERE o_orderdate >= '1994-01-01' AND o_orderdate < '1995-01-01'
      |GROUP BY c_nationkey""".stripMargin,
    Seq("customer", "orders", "lineitem"))

  /** Q6: forecasting revenue change (highly selective scan). */
  def q6(t: Tpch): Query = Query(
    "Q6",
    t.lineitem
      .where(col("l_shipdate") >= lit("1994-01-01") && col("l_shipdate") < lit("1995-01-01") &&
        col("l_discount").between(0.05, 0.07) && col("l_quantity") < 24)
      .agg(round(sum(col("l_extendedprice") * col("l_discount")), 0) as "revenue"),
    """SELECT ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * CAST(l_discount AS DOUBLE)), 0) AS revenue
      |FROM lineitem
      |WHERE l_shipdate >= '1994-01-01' AND l_shipdate < '1995-01-01'
      |  AND CAST(l_discount AS DOUBLE) BETWEEN 0.05 AND 0.07
      |  AND CAST(l_quantity AS DOUBLE) < 24""".stripMargin,
    Seq("lineitem"))

  /** Q12-lite: line counts per order status for 1994 shipments. */
  def q12(t: Tpch): Query = Query(
    "Q12",
    t.orders
      .join(t.lineitem, col("o_orderkey") === col("l_orderkey"))
      .where(col("l_shipdate") >= lit("1994-01-01") && col("l_shipdate") < lit("1995-01-01"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)) as "cnt"),
    """SELECT o_orderstatus, COUNT(*) AS cnt
      |FROM orders JOIN lineitem ON o_orderkey = l_orderkey
      |WHERE l_shipdate >= '1994-01-01' AND l_shipdate < '1995-01-01'
      |GROUP BY o_orderstatus""".stripMargin,
    Seq("orders", "lineitem"))

  /** Q14-lite: revenue per part type (promotion-effect building block). */
  def q14(t: Tpch): Query = Query(
    "Q14",
    t.lineitem
      .join(t.part, col("l_partkey") === col("p_partkey"))
      .groupBy("p_type")
      .agg(round(sum(col("l_extendedprice") * (lit(1) - col("l_discount"))), 0) as "revenue"),
    """SELECT p_type,
      |  ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 0) AS revenue
      |FROM lineitem JOIN part ON l_partkey = p_partkey
      |GROUP BY p_type""".stripMargin,
    Seq("lineitem", "part"))

  def all(t: Tpch): Seq[Query] = Seq(q1(t), q3(t), q5(t), q6(t), q12(t), q14(t))
}
