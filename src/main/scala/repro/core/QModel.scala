package repro.core

import repro.sim.MemoryConf

/** The guiding white-box model Q (paper Eq 8, Sec 5.2): maps a candidate
  * configuration + profiled statistics to three derived metrics that
  * separate desirable regions of the space from expensive ones.
  *
  *  - q1: expected heap occupancy — low ⇒ waste, >1 ⇒ unsafe.
  *  - q2: long-term memory efficiency — high ⇒ disk re-reads or Old-pool
  *        GC storms (Obs 5).
  *  - q3: shuffle memory efficiency — high ⇒ spill-triggered full GCs
  *        (Obs 7).
  */
object QModel {

  final case class Q(q1: Double, q2: Double, q3: Double) {
    def toArray: Array[Double] = Array(q1, q2, q3)
  }

  /** Modeled cache requirement m_c of Eq 1 for an arbitrary heap size. */
  def modeledCacheMb(st: Stats, mhMb: Double, delta: Double = RelM.delta): Double =
    if (st.mcMb <= 0) 0.0
    else mhMb * math.min(st.mcMb / (math.max(st.h, 1e-9) * st.mhMb), 1.0 - delta)

  /** Modeled per-task shuffle requirement m_s of Eq 2. */
  def modeledShuffleMb(st: Stats, mhMb: Double, delta: Double = RelM.delta): Double =
    if (st.msMb <= 0) 0.0
    else math.min(st.msMb / math.max(1e-9, 1.0 - st.s / st.p), (1.0 - delta) * mhMb)

  def derive(st: Stats, c: MemoryConf): Q = {
    val mh   = c.heapMb
    val mcX  = c.cacheCap * mh            // configured cache allocation
    val msX  = c.shuffleCap * mh / c.taskConcurrency // configured per-task shuffle
    val mcRq = modeledCacheMb(st, mh)
    val msRq = modeledShuffleMb(st, mh)

    val q1 = (st.miMb + math.min(mcX, mcRq) +
      c.taskConcurrency * (st.muMb + math.min(msX, msRq))) / mh

    val longTermAvail = math.max(1.0, math.min(c.oldMb, if (mcX > 0) mcX else c.oldMb))
    val q2 = (st.miMb + mcRq) / longTermAvail

    val q3 = c.taskConcurrency * math.min(msX, msRq) / math.max(1.0, 0.5 * c.edenMb)

    Q(q1, q2, q3)
  }
}
