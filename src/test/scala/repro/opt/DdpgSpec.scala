package repro.opt

import org.scalatest.funsuite.AnyFunSuite
import repro.sim._

/** DDPG tuner (Sec 5.3): CDBTune reward semantics and basic learning. */
class DdpgSpec extends AnyFunSuite {

  private val hw = Hardware.ClusterA
  private val sim = new Simulator(hw)
  private def ddpg(app: AppModel, n: Int = 10, seed: Long = 7) =
    new Ddpg(new ConfigSpace(hw, app), maxNewSamples = n, seed = seed)

  test("reward is positive iff performance beats the initial observation") {
    val d = ddpg(AppModel.svm)
    assert(d.reward(r0 = 100, rPrev = 90, rNow = 80) > 0)
    assert(d.reward(r0 = 100, rPrev = 90, rNow = 120) < 0)
  }

  test("reward scales with the magnitude of the improvement") {
    val d = ddpg(AppModel.svm)
    assert(d.reward(100, 100, 60) > d.reward(100, 100, 90))
    assert(d.reward(100, 100, 140) < d.reward(100, 100, 110))
  }

  test("the state vector is a normalized 11-dim resource/Q-metric snapshot") {
    val d = ddpg(AppModel.pageRank)
    val env = new TuningEnv(AppModel.pageRank, sim)
    val o = env.evaluate(MemoryConf.default(hw))
    val s = d.state(o)
    assert(s.length == d.stateDim)
    assert(s.forall(v => v >= 0.0 && v <= 1.0))
  }

  test("DDPG explores the budgeted number of stress tests and improves on default") {
    val env = new TuningEnv(AppModel.wordCount, sim)
    val tr = ddpg(AppModel.wordCount).tune(env)
    assert(tr.iterations <= 11)
    val defaultObj = env.history.head.objective
    assert(tr.best.objective <= defaultObj)
  }

  test("DDPG recommendations are legal knob settings") {
    val tr = ddpg(AppModel.kMeans, seed = 9).tune(new TuningEnv(AppModel.kMeans, sim))
    val c = tr.recommended
    assert(c.containersPerNode >= 1 && c.containersPerNode <= 4)
    assert(c.taskConcurrency <= hw.maxConcurrency(c.containersPerNode))
  }

  test("with a larger budget DDPG keeps improving (reward feedback works)") {
    val short = ddpg(AppModel.kMeans, n = 5, seed = 3).tune(new TuningEnv(AppModel.kMeans, sim, 1))
    val long = ddpg(AppModel.kMeans, n = 25, seed = 3).tune(new TuningEnv(AppModel.kMeans, sim, 1))
    assert(long.best.objective <= short.best.objective)
  }

  test("model size reporting covers both actor and critic") {
    val d = ddpg(AppModel.svm)
    assert(d.modelSizeBytes == 8L * (d.actor.paramCount + d.critic.paramCount))
    assert(d.modelSizeBytes > 1000)
  }
}
