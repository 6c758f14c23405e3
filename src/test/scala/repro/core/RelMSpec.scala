package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.sim._

/** End-to-end RelM (Sec 4, Fig 12) + the Section-6.4 analyses:
  * full-GC sensitivity (Fig 22), profile robustness (Fig 23), and the
  * utility-vs-performance ranking (Fig 24).
  */
class RelMSpec extends AnyFunSuite {

  private val hw = Hardware.ClusterA
  private val sim = new Simulator(hw)

  test("RelM recommendations are safe for every application (Fig 17 claim)") {
    for (app <- AppModel.clusterASuite) {
      val res = RelM.tune(app, sim)
      val run = sim.run(app, res.recommended, seed = 99)
      assert(run.safe, s"${app.name} → ${res.recommended}: " +
        s"failed=${run.failedContainers} aborted=${run.aborted}")
    }
  }

  test("RelM needs one or two profiled runs only (Sec 4.1)") {
    for (app <- AppModel.clusterASuite) {
      val res = RelM.tune(app, sim)
      assert(res.profileRuns.size <= 2, app.name)
    }
  }

  test("re-profiling triggers exactly when the first profile lacks full GCs") {
    for (app <- AppModel.clusterASuite) {
      val first = sim.run(app, MemoryConf.default(hw))
      val res = RelM.tune(app, sim)
      if (first.profile.hasFullGc) assert(res.profileRuns.size == 1, app.name)
      else {
        assert(res.profileRuns.size == 2, app.name)
        assert(res.profileRuns.last.profile.hasFullGc, app.name)
      }
    }
  }

  test("the re-profiling heuristics raise GC pressure (smaller heap, more NR)") {
    val c = MemoryConf.default(hw)
    val r = RelM.reprofileConf(hw, c)
    assert(r.heapMb < c.heapMb)
    assert(r.newRatio > c.newRatio)
  }

  test("Fig 22: without full-GC events M_u is over-estimated by ~2 orders of magnitude") {
    val run = sim.run(AppModel.svm, MemoryConf.default(hw))
    assert(!run.profile.hasFullGc) // SVM's default profile lacks full GCs
    val naive = StatsGenerator.fromProfile(run.profile)
    val factor = naive.muMb / AppModel.svm.taskUnmanagedMb
    assert(factor > 10 && factor < 200, s"over-estimation factor $factor")
  }

  test("Fig 22: over-estimated M_u yields over-provisioned (but safe) plans") {
    val run = sim.run(AppModel.svm, MemoryConf.default(hw))
    val naive = StatsGenerator.fromProfile(run.profile)
    val goodRes = RelM.tune(AppModel.svm, sim)
    val cands = RelM.candidates(naive, hw)
    assert(cands.nonEmpty) // cache-free fallback keeps RelM total
    val naiveBest = cands.maxBy(_.utility)
    // The conservative estimate can only lower concurrency…
    assert(naiveBest.p <= goodRes.recommendedArb.p)
    // …and the resulting plan is reliable but slower (paper Fig 22).
    val naiveRun = sim.run(AppModel.svm, RelM.toConf(hw, naiveBest))
    assert(naiveRun.safe)
    assert(naiveRun.runtimeSec >= sim.run(AppModel.svm, goodRes.recommended).runtimeSec)
  }

  test("Fig 23: M_u estimates are stable across full-GC-bearing profiles") {
    val profiles = for {
      n <- Seq(2, 4); p <- Seq(2); cap <- Seq(0.4, 0.6)
      run = sim.run(AppModel.kMeans, MemoryConf.of(hw, n, p, cap, 0.0, 2))
      if run.profile.hasFullGc
    } yield StatsGenerator.fromProfile(run.profile)
    assert(profiles.size >= 2)
    val mus = profiles.map(_.muMb)
    assert(mus.max / mus.min < 1.1) // little variance (log-scale plot in paper)
  }

  test("Fig 23: recommendations barely move across starting profiles") {
    val starts = Seq(
      MemoryConf.of(hw, 1, 2, 0.6, 0.0, 2),
      MemoryConf.of(hw, 2, 2, 0.6, 0.0, 2),
      MemoryConf.of(hw, 2, 1, 0.4, 0.0, 3))
    val runtimes = starts.map { s0 =>
      val res = RelM.tune(AppModel.kMeans, sim, startConf = Some(s0))
      sim.run(AppModel.kMeans, res.recommended, 17).runtimeSec
    }
    assert(runtimes.max / runtimes.min < 1.25)
  }

  test("Fig 24: the utility score ranks candidates consistently with performance") {
    // Aggregate over apps: among safe candidates, the top-utility pick must
    // not be far off the best candidate by actual runtime.
    for (app <- Seq(AppModel.kMeans, AppModel.svm, AppModel.wordCount)) {
      val res = RelM.tune(app, sim)
      val byRuntime = res.candidates.map(a => sim.run(app, RelM.toConf(hw, a), 3).runtimeSec)
      val pickRuntime = sim.run(app, res.recommended, 3).runtimeSec
      assert(pickRuntime <= byRuntime.min * 1.6,
        s"${app.name}: picked $pickRuntime vs best candidate ${byRuntime.min}")
    }
  }

  test("PageRank recommendation matches the paper's shape (2 containers, p=1, small cache)") {
    val res = RelM.tune(AppModel.pageRank, sim)
    val c = res.recommended
    assert(c.containersPerNode == 2)   // paper Table 8: 2
    assert(c.taskConcurrency == 1)     // paper Table 8: 1
    assert(c.cacheCap > 0.1 && c.cacheCap < 0.45) // paper: 0.24
  }

  test("TPC-H on Cluster B: RelM cuts the default runtime substantially (Fig 21)") {
    val simB = new Simulator(Hardware.ClusterB)
    val default = simB.run(AppModel.tpch, MemoryConf.default(Hardware.ClusterB))
    val res = RelM.tune(AppModel.tpch, simB)
    val tuned = simB.run(AppModel.tpch, res.recommended)
    assert(tuned.safe)
    assert(tuned.runtimeSec < 0.75 * default.runtimeSec) // paper: 40% saving
  }

  test("candidate enumeration covers only feasible container sizes") {
    val res = RelM.tune(AppModel.pageRank, sim)
    // PageRank's 770MB tasks + cache cannot fit 3-4 containers per node.
    assert(res.candidates.map(_.n).forall(n => n == 1 || n == 2))
  }
}
