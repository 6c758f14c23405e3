package repro.bench

import repro.tables.Tables

/** Paper Table 10: per-iteration algorithm overheads. Paper readings:
  * DDPG fit 100ms / probe 2ms / 3KB; BO fit 140ms / probe 800ms / 5KB;
  * GBO fit 180ms / probe 1500ms / 6KB; RelM fit 0.1ms / probe 0.02ms.
  * Absolute times differ with hardware; the ordering claims are asserted.
  */
class Table10OverheadsBench extends BenchSuite {

  private lazy val rows = Tables.table10(sim)
  private def row(p: String) = rows.find(_.policy == p).get

  test("Table 10 prints per-iteration overheads for every policy") {
    emit(Tables.render("Table 10 — Algorithm overheads per iteration",
      Seq("Component", "DDPG", "BO", "GBO", "RelM"),
      Seq(
        Seq("Statistics Collection (ms)") ++ rows.map(r => f"${r.statsCollectMs}%.3f"),
        Seq("Model Fitting (ms)") ++ rows.map(r => f"${r.fitMs}%.3f"),
        Seq("Model Probing (ms)") ++ rows.map(r => f"${r.probeMs}%.3f"),
        Seq("Model Size (bytes)") ++ rows.map(r => if (r.modelSizeBytes == 0) "-" else r.modelSizeBytes.toString),
      )))
    assert(rows.map(_.policy) == Seq("DDPG", "BO", "GBO", "RelM"))
  }

  test("a RelM iteration (fit + probe) is far cheaper than any black-box iteration") {
    val relm = row("RelM").fitMs + row("RelM").probeMs
    assert(relm < (row("BO").fitMs + row("BO").probeMs) / 2)
    assert(relm < (row("GBO").fitMs + row("GBO").probeMs) / 2)
  }

  test("probing the GP over the grid dwarfs probing RelM's candidate list") {
    assert(row("RelM").probeMs < row("BO").probeMs)
    assert(row("RelM").probeMs < row("GBO").probeMs)
  }

  test("GBO pays the model-Q dimensions: statistics work and a bigger model") {
    // (Sub-millisecond probe timings are too jittery for a strict ordering;
    // the structural costs — the white-box statistics pass and the extra
    // stored feature columns — are deterministic.)
    assert(row("GBO").statsCollectMs > row("BO").statsCollectMs)
    assert(row("GBO").modelSizeBytes > row("BO").modelSizeBytes)
  }

  test("DDPG's probe (one actor forward pass) is far cheaper than a GP sweep") {
    assert(row("DDPG").probeMs < row("BO").probeMs)
  }

  test("model sizes: BO stores training data, DDPG stores network weights, RelM nothing") {
    assert(row("RelM").modelSizeBytes == 0)
    assert(row("BO").modelSizeBytes > 0)
    assert(row("DDPG").modelSizeBytes > row("BO").modelSizeBytes) // 64x64 nets
  }

  test("all timings are positive and bounded (sanity)") {
    for (r <- rows) {
      assert(r.fitMs >= 0 && r.fitMs < 60000)
      assert(r.probeMs >= 0 && r.probeMs < 60000)
    }
  }
}
