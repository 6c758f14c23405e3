package repro.workloads

import repro.{Oracle, SparkSpec, SynthData}

class SortByKeySpec extends SparkSpec {

  private lazy val pairs = SynthData.uniformKeys(spark, rows = 20000, nKeys = 500).cache()

  test("the sorted prefix matches the DuckDB oracle") {
    Oracle.assertEquivalent(SortByKeyW.smallest(pairs, 50), SortByKeyW.oracleSql(50),
      "pairs" -> pairs)
  }

  test("output is globally non-decreasing in the key") {
    val ks = SortByKeyW.sorted(pairs).select("k").collect().map(_.getLong(0))
    assert(ks.sliding(2).forall(w => w.length < 2 || w(0) <= w(1)))
  }

  test("sorting preserves the multiset of rows") {
    assert(SortByKeyW.sorted(pairs).count() == pairs.count())
    val sumBefore = pairs.groupBy().sum("k").collect()(0).getLong(0)
    val sumAfter = SortByKeyW.sorted(pairs).groupBy().sum("k").collect()(0).getLong(0)
    assert(sumBefore == sumAfter)
  }

  test("the shuffle path is exercised (range partitioning, no broadcast)") {
    val plan = SortByKeyW.sorted(pairs).queryExecution.executedPlan.toString
    assert(plan.contains("Exchange") || plan.contains("Sort"))
  }
}
