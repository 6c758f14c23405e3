package repro.tables

import repro.core.{QModel, RelM, StatsGenerator}
import repro.opt._
import repro.sim._

/** Row builders for every table reproduced from the paper's evaluation.
  * Benches assert on these structures and print them; jobs/ entrypoints
  * print them from spark-submit. Everything is deterministic in the seeds.
  */
object Tables {

  // ---------------------------------------------------------------- shared

  final case class PolicyRow(
      app: String,
      policy: String,
      conf: MemoryConf,
      runtimeMin: Double,
      failedContainers: Int,
      aborted: Boolean,
      iterations: Int,
  )

  def fmtConf(c: MemoryConf): String =
    f"n=${c.containersPerNode} p=${c.taskConcurrency} cache=${c.cacheCap}%.2f " +
      f"shuffle=${c.shuffleCap}%.2f NR=${c.newRatio}"

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    (s"== $title ==" +: line(header) +: ("|" + widths.map(w => "-" * (w + 2)).mkString("|") + "|") +:
      rows.map(line)).mkString("\n")
  }

  // ------------------------------------------------------- Table 4 (defaults)

  /** Config values suggested by MaxResourceAllocation + framework defaults. */
  def table4(hw: Hardware): Seq[(String, String)] = {
    val d = MemoryConf.default(hw)
    Seq(
      "Containers per Node" -> d.containersPerNode.toString,
      "Heap Size" -> f"${d.heapMb}%.0fMB",
      "Task Concurrency" -> d.taskConcurrency.toString,
      "Cache Capacity + Shuffle Capacity" -> f"${d.cacheCap + d.shuffleCap}%.1f",
      "NewRatio" -> d.newRatio.toString,
      "SurvivorRatio" -> d.survivorRatio.toString,
    )
  }

  // ------------------------------------------------ Table 5 (manual PageRank)

  final case class ManualRow(containers: Int, p: Int, cacheCap: Double, nr: Int,
                             result: RunResult)

  /** The paper's four manual-tuning steps for PageRank (Sec 3.5). */
  def table5(sim: Simulator, seed: Long = 0L): Seq[ManualRow] = {
    val hw = sim.hw
    Seq((2, 0.6, 2), (1, 0.6, 2), (2, 0.4, 2), (2, 0.6, 5)).map { case (p, cap, nr) =>
      val c = MemoryConf.of(hw, 1, p, cap, 0.0, nr)
      ManualRow(1, p, cap, nr, sim.run(AppModel.pageRank, c, seed))
    }
  }

  // --------------------------------------------------- Table 6 (stats vector)

  /** Statistics derived from the PageRank default-configuration profile. */
  def table6(sim: Simulator, seed: Long = 0L): repro.core.Stats = {
    val run = sim.run(AppModel.pageRank, MemoryConf.default(sim.hw), seed)
    StatsGenerator.fromProfile(run.profile)
  }

  // --------------------------------------------------- Table 7 (LHS samples)

  def table7(hw: Hardware, app: AppModel = AppModel.svm, seed: Long = 42L): Vector[MemoryConf] =
    new ConfigSpace(hw, app).lhs(4, seed)

  // ------------------------------------------- Table 8 (policy recommendations)

  final case class Table8Result(
      rows: Seq[PolicyRow],
      defaultRuns: Map[String, RunResult],
      exhaustive: Map[String, TuningTrace],
  ) {
    def row(app: String, policy: String): PolicyRow =
      rows.find(r => r.app == app && r.policy == policy).get

    /** 5th-percentile runtime of the exhaustive grid for `app` — the paper's
      * "top 5 percentile of the exhaustively searched configurations" bar.
      */
    def top5PctileMin(app: String): Double = {
      val objs = exhaustive(app).history.map(_.objective).sorted
      objs((objs.size * 5) / 100) / 60.0
    }
  }

  /** Run every tuning policy on every Cluster-A application (paper Table 8 +
    * the aggregate claims of Figs 16/17).
    */
  def table8(sim: Simulator, seed: Long = 0L,
             apps: Seq[AppModel] = AppModel.clusterASuite): Table8Result = {
    val hw = sim.hw
    val rows = Vector.newBuilder[PolicyRow]
    var defaults = Map.empty[String, RunResult]
    var exh = Map.empty[String, TuningTrace]

    for (app <- apps) {
      val space = new ConfigSpace(hw, app)
      val defaultRun = sim.run(app, MemoryConf.default(hw), seed)
      defaults += app.name -> defaultRun

      def record(policy: String, tr: TuningTrace): Unit =
        rows += PolicyRow(app.name, policy, tr.recommended,
          tr.best.result.runtimeMin, tr.best.result.failedContainers,
          tr.best.result.aborted, tr.iterations)

      val exhTrace = Exhaustive.tune(space, new TuningEnv(app, sim, seed))
      exh += app.name -> exhTrace
      record("Exhaustive", exhTrace)

      record("DDPG", new Ddpg(space, maxNewSamples = 10, seed = seed + 7)
        .tune(new TuningEnv(app, sim, seed)))

      record("BO", new BayesOpt(space, guide = None, seed = seed + 42)
        .tune(new TuningEnv(app, sim, seed)))

      val (stats, _) = RelM.gatherStats(app, sim, MemoryConf.default(hw), seed)
      record("GBO", new BayesOpt(space, guide = Some(stats), seed = seed + 42)
        .tune(new TuningEnv(app, sim, seed)))

      val relm = RelM.tune(app, sim, seed)
      val relmEnv = new TuningEnv(app, sim, seed)
      val relmObs = relmEnv.evaluate(relm.recommended)
      rows += PolicyRow(app.name, "RelM", relm.recommended,
        relmObs.result.runtimeMin, relmObs.result.failedContainers,
        relmObs.result.aborted, relm.profileRuns.size)
    }
    Table8Result(rows.result(), defaults, exh)
  }

  // ----------------------------------------------------- Table 9 (BO run log)

  /** Log of one BO run for SVM: the 4 LHS bootstrap samples then the
    * adaptive probes, with runtimes (paper Table 9).
    */
  def table9(sim: Simulator, seed: Long = 0L): Vector[(Int, Observation)] = {
    val app = AppModel.svm
    val space = new ConfigSpace(sim.hw, app)
    val env = new TuningEnv(app, sim, seed)
    new BayesOpt(space, guide = None, seed = seed + 42).tune(env)
    env.history.zipWithIndex.map { case (o, i) =>
      (math.max(0, i - 3), o) // paper labels the 4 LHS samples "0"
    }
  }

  // ------------------------------------------- Table 10 (algorithm overheads)

  final case class OverheadRow(policy: String, statsCollectMs: Double,
                               fitMs: Double, probeMs: Double, modelSizeBytes: Long)

  private def timeMs[T](body: => T): (T, Double) = {
    // JIT warmup, then best-of-5: Table 10 compares steady-state costs.
    body; body
    var best = Double.MaxValue
    var r = body
    for (_ <- 1 to 5) {
      val t0 = System.nanoTime()
      r = body
      best = math.min(best, (System.nanoTime() - t0) / 1e6)
    }
    (r, best)
  }

  /** Measure one iteration's overhead components per policy (paper Table 10):
    * statistics collection, model fitting, model probing, stored model size.
    */
  def table10(sim: Simulator, seed: Long = 0L): Seq[OverheadRow] = {
    val hw = sim.hw
    val app = AppModel.svm
    val space = new ConfigSpace(hw, app)

    // A training history to fit against (10 observations).
    val env = new TuningEnv(app, sim, seed)
    val samples = space.lhs(10, seed)
    samples.foreach(env.evaluate)
    val hist = env.history
    val run = hist.head.result

    val (stats, statsMs) = timeMs(StatsGenerator.fromProfile(run.profile))
    val (_, qMs) = timeMs(QModel.derive(stats, run.conf))

    // BO: GP fit + EI argmax over the unseen grid.
    val bo = new BayesOpt(space, guide = None, seed = seed)
    val x = hist.map(o => bo.features(o.conf)).toArray
    val y = hist.map(_.objective).toArray
    val gp = new GaussianProcess()
    val (_, boFit) = timeMs(gp.fit(x, y))
    val tau = y.min
    val (_, boProbe) = timeMs {
      space.all.iterator.map { c =>
        val (m, s) = gp.predict(bo.features(c)); bo.expectedImprovement(m, s, tau)
      }.max
    }
    val boSize = 8L * hist.size * (x.head.length + 1)

    // GBO: same with the three extra model-Q dimensions.
    val gbo = new BayesOpt(space, guide = Some(stats), seed = seed)
    val xg = hist.map(o => gbo.features(o.conf)).toArray
    val gpg = new GaussianProcess()
    val (_, gboFit0) = timeMs(gpg.fit(xg, y))
    val gboFit = gboFit0 + qMs
    val (_, gboProbe) = timeMs {
      space.all.iterator.map { c =>
        val (m, s) = gpg.predict(gbo.features(c)); gbo.expectedImprovement(m, s, tau)
      }.max
    }
    val gboSize = 8L * hist.size * (xg.head.length + 1)

    // DDPG: one replay-batch actor-critic update (fit) + one action (probe).
    val ddpg = new Ddpg(space, seed = seed)
    val ddpgEnv = new TuningEnv(app, sim, seed + 1)
    ddpg.tune(ddpgEnv, Some(MemoryConf.default(hw))) // populate the replay buffer
    val (_, ddpgFit) = timeMs(ddpg.train())
    val s0 = ddpg.state(hist.head)
    val (_, ddpgProbe) = timeMs(ddpg.actor(s0))

    // RelM: one analytical evaluation (fit) + candidate ranking (probe).
    val (cands, relmFit) = timeMs(RelM.candidates(stats, hw))
    val (_, relmProbe) = timeMs(cands.maxBy(_.utility))

    Seq(
      OverheadRow("DDPG", statsCollectMs = statsMs + qMs, fitMs = ddpgFit,
        probeMs = ddpgProbe, modelSizeBytes = ddpg.modelSizeBytes),
      OverheadRow("BO", statsCollectMs = 0.0, fitMs = boFit, probeMs = boProbe,
        modelSizeBytes = boSize),
      OverheadRow("GBO", statsCollectMs = statsMs + qMs, fitMs = gboFit,
        probeMs = gboProbe, modelSizeBytes = gboSize),
      OverheadRow("RelM", statsCollectMs = statsMs, fitMs = relmFit,
        probeMs = relmProbe, modelSizeBytes = 0L),
    )
  }

  // ------------------------------------------------- TPC-H headline (Fig 21)

  /** Default-vs-RelM TPC-H runtimes on Cluster B (paper: 66 min → 40 min). */
  def tpchHeadline(seed: Long = 0L): (RunResult, RunResult) = {
    val sim = new Simulator(Hardware.ClusterB)
    val default = sim.run(AppModel.tpch, MemoryConf.default(Hardware.ClusterB), seed)
    val relm = RelM.tune(AppModel.tpch, sim, seed)
    (default, sim.run(AppModel.tpch, relm.recommended, seed))
  }
}
