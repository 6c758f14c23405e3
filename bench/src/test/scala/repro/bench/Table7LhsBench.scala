package repro.bench

import repro.tables.Tables

/** Paper Table 7: the 4 Latin-Hypercube samples bootstrapping BO.
  * The paper's draws are one realization; the properties that matter are the
  * stratified coverage of each dimension.
  */
class Table7LhsBench extends BenchSuite {

  private lazy val samples = Tables.table7(hw)

  test("Table 7 prints our LHS bootstrap draw") {
    emit(Tables.render(
      "Table 7 — LHS bootstrap samples (paper draw: n=1..4, p∈{4,1,2,2}, cap∈{.6,.4,.2,.8}, NR∈{7,3,5,1})",
      Seq("Containers", "TaskConcurrency", "Cache/Shuffle Capacity", "NewRatio"),
      samples.map(c => Seq(c.containersPerNode.toString, c.taskConcurrency.toString,
        f"${math.max(c.cacheCap, c.shuffleCap)}%.2f", c.newRatio.toString))))
    assert(samples.size == 4)
  }

  test("every container count appears exactly once (like the paper's draw)") {
    assert(samples.map(_.containersPerNode).sorted == Vector(1, 2, 3, 4))
  }

  test("capacity samples cover all four quartiles") {
    val caps = samples.map(c => math.max(c.cacheCap, c.shuffleCap))
    val quartiles = caps.map(c => math.min(3, ((c - 0.05) / 0.75 * 4).toInt))
    assert(quartiles.distinct.size == 4)
  }

  test("NewRatio samples are spread over at least three distinct strata") {
    assert(samples.map(c => (c.newRatio - 1) / 3).distinct.size >= 3 ||
      samples.map(_.newRatio).distinct.size == 4)
  }

  test("all samples are legal configurations") {
    for (c <- samples) {
      assert(c.taskConcurrency <= hw.maxConcurrency(c.containersPerNode))
      assert(c.newRatio >= 1 && c.newRatio <= 9)
    }
  }
}
