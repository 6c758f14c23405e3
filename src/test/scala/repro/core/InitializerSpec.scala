package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Eqs 1-4 of the paper (Sec 4.2), anchored on the PageRank worked example:
  * stats of Table 6 → m_c ≈ 3.8-4.0 GB, m_s = 0, p = 5, NR = 9 (Eq 5).
  */
class InitializerSpec extends AnyFunSuite {

  /** Paper Table 6's statistics vector (PageRank on the default setup). */
  val pageRankStats: Stats = Stats(
    n = 1, mhMb = 4404, cpuAvgPct = 35, diskAvgPct = 2,
    miMb = 115, mcMb = 2300, msMb = 0, muMb = 770,
    p = 2, h = 0.3, s = 0, hasFullGc = true)

  test("Eq 5: PageRank example yields p=5, NR=9, ms=0, mc near 3.8GB") {
    val ic = Initializer.init(pageRankStats, n = 1, mhMb = 4404, maxP = 8)
    assert(ic.p == 5)           // min(pCpu=5.14, pMem=5.15) floored
    assert(ic.nr == 9)          // Eq 3 demands >9, capped at 9 (Sec 6.1)
    assert(ic.msMb == 0.0)
    // paper reports 3798MB; Eq 1 with the (1-δ) cap gives 3963.6 — within 5%
    assert(math.abs(ic.mcMb - 3798) / 3798 < 0.05)
  }

  test("Eq 1: cache requirement scales inversely with the observed hit ratio") {
    val base = pageRankStats
    val better = base.copy(h = 0.6)
    val icLow = Initializer.init(base, 1, 4404, 8)
    val icHigh = Initializer.init(better, 1, 4404, 8)
    assert(icHigh.mcMb <= icLow.mcMb)
    assert(math.abs(icHigh.mcMb - 4404 * 2300 / (0.6 * 4404)) < 1e-6)
  }

  test("Eq 1: no cache usage means no cache pool") {
    assert(Initializer.init(pageRankStats.copy(mcMb = 0), 1, 4404, 8).mcMb == 0.0)
  }

  test("Eq 2: shuffle requirement scales up with the spill fraction") {
    val st = pageRankStats.copy(msMb = 500, s = 0.5, p = 2)
    val ic = Initializer.init(st, 1, 4404, 8)
    assert(math.abs(ic.msMb - 500 / (1 - 0.5 / 2)) < 1e-6)
  }

  test("Eq 2: shuffle allocation is capped at (1-δ) of heap") {
    val st = pageRankStats.copy(msMb = 6000, s = 0.9, p = 1)
    val ic = Initializer.init(st, 1, 4404, 8)
    assert(ic.msMb <= 0.9 * 4404 + 1e-6)
  }

  test("Eq 4: concurrency halves (at least) when containers double") {
    val p1 = Initializer.init(pageRankStats, 1, 4404, 8).p
    val p2 = Initializer.init(pageRankStats, 2, 2202, 4).p
    assert(p2 <= math.max(1, p1 / 2))
  }

  test("Eq 4: memory-bound apps get concurrency from heap / M_u") {
    val st = pageRankStats.copy(cpuAvgPct = 4, diskAvgPct = 0, muMb = 1500)
    val ic = Initializer.init(st, 1, 4404, 8)
    assert(ic.p == math.floor(0.9 * 4404 / 1500).toInt)
  }

  test("Eq 4: near-idle resources do not bound concurrency") {
    val st = pageRankStats.copy(cpuAvgPct = 0.1, diskAvgPct = 0.1, muMb = 500)
    val ic = Initializer.init(st, 1, 4404, 8)
    assert(ic.p == math.min(8, math.floor(0.9 * 4404 / 500).toInt))
  }

  test("Eq 4: re-profiles on n containers normalize per-task utilization") {
    // Same per-task load expressed via a 4-container profile must give the
    // same answer as a 1-container profile.
    val oneC = pageRankStats.copy(n = 1, p = 4, cpuAvgPct = 40)
    val fourC = pageRankStats.copy(n = 4, p = 1, cpuAvgPct = 40)
    assert(Initializer.init(oneC, 2, 2202, 4).p == Initializer.init(fourC, 2, 2202, 4).p)
  }

  test("Eq 3: NewRatio covers the long-term pools and stays in [1, 9]") {
    assert(Initializer.newRatioFor(100, 4404) == 1)
    assert(Initializer.newRatioFor(2936, 4404) == 2)
    assert(Initializer.newRatioFor(4300, 4404) == 9)
    assert(Initializer.newRatioFor(5000, 4404) == 9)
    for (lt <- Seq(0.0, 500.0, 1500.0, 2500.0, 3500.0)) {
      val nr = Initializer.newRatioFor(lt, 4404)
      assert(nr >= 1 && nr <= 9)
      if (nr < 9) assert(4404.0 * nr / (nr + 1) >= lt)
    }
  }

  test("concurrency respects the hard per-container core bound") {
    val st = pageRankStats.copy(cpuAvgPct = 0.1, diskAvgPct = 0.1, muMb = 10)
    assert(Initializer.init(st, 4, 1101, 2).p == 2)
  }
}
