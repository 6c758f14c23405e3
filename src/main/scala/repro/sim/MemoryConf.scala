package repro.sim

/** The Table-1 knob vector — the configuration space every tuner explores.
  *
  * @param containersPerNode containers the resource manager carves per node
  * @param heapMb            heap of one container (maxHeapPerNode / n)
  * @param taskConcurrency   execution slots per container (paper: P)
  * @param cacheCap          Cache Capacity as a fraction of heap
  * @param shuffleCap        Shuffle Capacity as a fraction of heap
  * @param newRatio          ParallelGC NewRatio = Old/Young capacity ratio
  * @param survivorRatio     ParallelGC SurvivorRatio (paper keeps default 8)
  */
final case class MemoryConf(
    containersPerNode: Int,
    heapMb: Double,
    taskConcurrency: Int,
    cacheCap: Double,
    shuffleCap: Double,
    newRatio: Int,
    survivorRatio: Int = 8,
) {
  require(containersPerNode >= 1, s"containersPerNode=$containersPerNode")
  require(taskConcurrency >= 1, s"taskConcurrency=$taskConcurrency")
  require(newRatio >= 1, s"newRatio=$newRatio")
  require(cacheCap >= 0 && shuffleCap >= 0, s"caps=($cacheCap,$shuffleCap)")

  /** Old-generation capacity: m_o = m_h * NR/(NR+1)  (paper Eq 3). */
  def oldMb: Double = heapMb * newRatio / (newRatio + 1)

  /** Young-generation capacity. */
  def youngMb: Double = heapMb / (newRatio + 1)

  /** Eden capacity: m_e = m_h * 1/(NR+1) * (SR-2)/SR  (paper Eq 3). */
  def edenMb: Double = youngMb * (survivorRatio - 2) / survivorRatio

  /** One survivor space (two exist; one is always empty). */
  def survivorMb: Double = youngMb / survivorRatio

  /** Unified cache+shuffle pool, Spark-style: fraction of (heap − reserved). */
  def unifiedMb: Double = (cacheCap + shuffleCap) * math.max(0.0, heapMb - GcModel.Constants.jvmReservedMb)

  override def toString: String =
    f"MemoryConf(n=$containersPerNode heap=${heapMb}%.0fMB p=$taskConcurrency " +
      f"cache=$cacheCap%.2f shuffle=$shuffleCap%.2f NR=$newRatio SR=$survivorRatio)"
}

object MemoryConf {
  /** Build a configuration for `n` containers per node on `hw`. */
  def of(hw: Hardware, n: Int, p: Int, cacheCap: Double, shuffleCap: Double,
         newRatio: Int, survivorRatio: Int = 8): MemoryConf =
    MemoryConf(n, hw.heapMb(n), p, cacheCap, shuffleCap, newRatio, survivorRatio)

  /** Amazon EMR MaxResourceAllocation + framework defaults (paper Table 4):
    * one fat container per node, all heap, Task Concurrency 2, unified
    * cache+shuffle pool 0.6, NewRatio 2, SurvivorRatio 8. The unified pool is
    * given entirely to the app's dominant use (Spark's unified manager lets
    * either side take the whole fraction), which we encode as cacheCap=0.6 —
    * the simulator's execution-first sharing hands it to shuffle for apps
    * that do not cache.
    */
  def default(hw: Hardware): MemoryConf = of(hw, n = 1, p = 2, cacheCap = 0.6, shuffleCap = 0.0, newRatio = 2)
}
