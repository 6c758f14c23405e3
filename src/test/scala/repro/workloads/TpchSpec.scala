package repro.workloads

import repro.{Oracle, SparkSpec}
import TpchQueries._

/** The TPC-H-lite SQL suite: every query oracle-checked against DuckDB over
  * the same synthetic tables (paper Table 2 "SQL" class, Fig 21 workload).
  */
class TpchSpec extends SparkSpec {

  private lazy val t = Tpch(spark, sf = 0.01)
  private lazy val tables: Map[String, org.apache.spark.sql.DataFrame] = Map(
    "lineitem" -> t.lineitem.cache(),
    "orders" -> t.orders.cache(),
    "customer" -> t.customer.cache(),
    "part" -> t.part.cache(),
  )

  for (qf <- Seq(q1 _, q3 _, q5 _, q6 _, q12 _, q14 _)) {
    val q = qf(Tpch(spark, sf = 0.01)) // name only; DataFrames built lazily below
    test(s"${q.name} matches the DuckDB oracle") {
      val query = qf(t)
      Oracle.assertEquivalent(query.spark, query.duckSql,
        query.tables.map(n => n -> tables(n)): _*)
    }
  }

  test("Q1 aggregates all six return-flag/status groups") {
    assert(q1(t).spark.count() == 6)
  }

  test("Q6 is a single highly-selective aggregate") {
    val df = q6(t).spark
    assert(df.count() == 1)
    assert(df.collect()(0).getDouble(0) > 0)
  }

  test("the join queries exercise the shuffle-join path (broadcast disabled)") {
    val plan = q3(t).spark.queryExecution.executedPlan.toString
    assert(plan.contains("SortMergeJoin") || plan.contains("ShuffledHashJoin"), plan.take(500))
  }

  test("the suite covers scans, joins and multi-table aggregation") {
    val qs = all(t)
    assert(qs.size == 6)
    assert(qs.exists(_.tables.size >= 3)) // customer ⋈ orders ⋈ lineitem
    assert(qs.exists(_.tables == Seq("lineitem")))
  }
}
