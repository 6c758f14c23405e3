package repro.sim

/** Physical cluster substrate (paper Table 3).
  *
  * A node's memory is handed to the resource manager, which slices it into
  * 1..4 homogeneous containers (paper Sec 4, "Example"); `maxHeapPerNodeMb`
  * is the total heap the resource manager may hand out per node (node memory
  * minus OS overheads — 4404 MB on Cluster A's 6 GB nodes).
  *
  * @param name              cluster label ("A" physical, "B" EC2)
  * @param nodes             worker node count
  * @param memPerNodeMb      physical memory per node (container-kill cap base)
  * @param coresPerNode      physical cores (bounds Task Concurrency)
  * @param maxHeapPerNodeMb  heap distributable across the node's containers
  * @param diskStreamsPerNode effective concurrent disk/network streams a node
  *                           sustains before I/O-bound tasks queue (Obs 3)
  */
final case class Hardware(
    name: String,
    nodes: Int,
    memPerNodeMb: Int,
    coresPerNode: Int,
    maxHeapPerNodeMb: Int,
    diskStreamsPerNode: Int = 2,
) {
  /** Containers-per-node choices the resource manager can realize. */
  val containerChoices: Seq[Int] = 1 to 4

  /** Heap of each container when the node runs `n` of them. */
  def heapMb(n: Int): Double = maxHeapPerNodeMb.toDouble / n

  /** Max Task Concurrency per container when the node runs `n` of them
    * (paper Sec 6.1: bounded by physical cores / containers).
    */
  def maxConcurrency(n: Int): Int = math.max(1, coresPerNode / n)

  /** Physical-memory cap the resource manager enforces per container
    * (exceeding it gets the container killed — Fig 5/Fig 11 mechanism).
    */
  def containerPhysCapMb(n: Int): Double = memPerNodeMb * 0.9 / n
}

object Hardware {
  /** Paper Cluster A: 8 physical nodes, 6 GB / 8 cores, 1 Gbps. */
  val ClusterA: Hardware =
    Hardware(name = "A", nodes = 8, memPerNodeMb = 6144, coresPerNode = 8, maxHeapPerNodeMb = 4404)

  /** Paper Cluster B: 4 virtual EC2 nodes, 32 GB / 31 ECU (~16 cores), 10 Gbps. */
  val ClusterB: Hardware =
    Hardware(name = "B", nodes = 4, memPerNodeMb = 32768, coresPerNode = 16,
             maxHeapPerNodeMb = 16384, diskStreamsPerNode = 4)
}
