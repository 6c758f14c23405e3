package repro.opt

import repro.core.{QModel, StatsGenerator}
import scala.collection.mutable.ArrayBuffer

/** Deep Deterministic Policy Gradient tuner (paper Sec 5.3, Fig 15).
  *
  * State  = resource-usage metrics of the last run (the Table-6 statistics)
  *          plus the model-Q metrics, following the paper's GBO-inspired
  *          state design.
  * Action = continuous point in the 4-dim knob space, mapped to the grid.
  * Reward = CDBTune-style: compares performance against both the initial
  *          and the previous observation.
  * Actor/critic are tanh MLPs with target networks, replay buffer, and
  * Adam — a faithful, scaled-down CDBTune parameterization.
  */
final class Ddpg(space: ConfigSpace,
                 maxNewSamples: Int = 10,
                 gamma: Double = 0.9,
                 tau: Double = 0.05,
                 batch: Int = 16,
                 seed: Long = 7L) {

  private val rnd = new scala.util.Random(seed)
  val stateDim = 11
  val actionDim = 4

  val actor = new Mlp(Array(stateDim, 64, 64, actionDim), outTanh = true, seed)
  val critic = new Mlp(Array(stateDim + actionDim, 64, 64, 1), outTanh = false, seed + 1)
  private val actorT = new Mlp(Array(stateDim, 64, 64, actionDim), outTanh = true, seed + 2)
  private val criticT = new Mlp(Array(stateDim + actionDim, 64, 64, 1), outTanh = false, seed + 3)
  actorT.copyFrom(actor); criticT.copyFrom(critic)

  private case class Transition(s: Array[Double], a: Array[Double], r: Double, s2: Array[Double])
  private val replay = ArrayBuffer.empty[Transition]

  /** Observation → normalized state vector. */
  def state(o: Observation): Array[Double] = {
    val st = StatsGenerator.fromProfile(o.result.profile)
    val q = QModel.derive(st, o.conf)
    def cl(x: Double) = math.min(3.0, math.max(0.0, x)) / 3.0
    Array(
      st.cpuAvgPct / 100.0, st.diskAvgPct / 100.0,
      st.miMb / st.mhMb, st.mcMb / st.mhMb, st.msMb / st.mhMb,
      math.min(1.0, st.muMb / st.mhMb),
      st.h, st.s, cl(q.q1), cl(q.q2), cl(q.q3),
    )
  }

  /** CDBTune reward: positive when beating the initial performance, scaled
    * by the change vs the previous step (paper Sec 5.3).
    */
  def reward(r0: Double, rPrev: Double, rNow: Double): Double = {
    val d0 = (r0 - rNow) / r0
    val dPrev = (rPrev - rNow) / rPrev
    if (d0 > 0) (math.pow(1 + d0, 2) - 1) * math.abs(1 + dPrev)
    else -(math.pow(1 - d0, 2) - 1) * math.abs(1 - dPrev)
  }

  /** One actor-critic update over a replay minibatch (public so Table 10
    * can time a single model-fitting step).
    */
  def train(): Unit = {
    if (replay.size < 4) return
    val (gwC, gbC) = critic.zeroGrads()
    val (gwA, gbA) = actor.zeroGrads()
    val n = math.min(batch, replay.size)
    var k = 0
    while (k < n) {
      val tr = replay(rnd.nextInt(replay.size))
      // Critic target: y = r + γ Q'(s', μ'(s'))
      val a2 = actorT(tr.s2)
      val q2 = criticT(tr.s2 ++ a2)(0)
      val y = tr.r + gamma * q2
      val ct = critic.forward(tr.s ++ tr.a)
      val err = ct.output(0) - y
      critic.backward(ct, Array(2.0 * err / n), gwC, gbC)

      // Actor: ascend Q(s, μ(s)) — backprop −∂Q/∂a through the actor.
      val at = actor.forward(tr.s)
      val cQ = critic.forward(tr.s ++ at.output)
      val gIn = critic.backward(cQ, Array(-1.0 / n), critic.zeroGrads()._1, critic.zeroGrads()._2)
      actor.backward(at, gIn.drop(stateDim), gwA, gbA)
      k += 1
    }
    critic.adamStep(gwC, gbC, lr = 1e-2)
    actor.adamStep(gwA, gbA, lr = 1e-3)
    actorT.softUpdateFrom(actor, tau)
    criticT.softUpdateFrom(critic, tau)
  }

  def tune(env: TuningEnv, startConf: Option[repro.sim.MemoryConf] = None): TuningTrace = {
    val start = startConf.getOrElse(repro.sim.MemoryConf.default(space.hw))
    var prev = env.evaluate(start)
    val r0 = prev.objective
    var s = state(prev)
    var noise = 0.6
    var guard = 0
    while (env.iterations < maxNewSamples + 1 && guard < maxNewSamples * 8) {
      val aRaw = actor(s)
      val a = aRaw.map(v => math.max(-1.0, math.min(1.0, v + noise * rnd.nextGaussian())))
      val conf = space.fromUnit(a.map(v => (v + 1) / 2))
      val obs = env.evaluate(conf)
      val r = reward(r0, prev.objective, obs.objective)
      val s2 = state(obs)
      replay += Transition(s, a, r, s2)
      (1 to 4).foreach(_ => train())
      s = s2
      prev = obs
      noise = math.max(0.1, noise * 0.92)
      guard += 1
    }
    val best = env.bestObservation
    TuningTrace("DDPG", best.conf, best, env.history, env.iterations)
  }

  /** Stored model size in bytes (Table 10's last row): actor+critic
    * parameters at 8 bytes each.
    */
  def modelSizeBytes: Long = 8L * (actor.paramCount + critic.paramCount)
}
