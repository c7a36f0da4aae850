package repro.core

/** Hybrid Edge Partitioner (the paper's primary contribution).
  *
  * Pipeline (Section 3): build the pruned CSR for threshold `tau` (diverting
  * `E_h2h` to a side buffer), run NE++ over the in-memory edges, then stream
  * the h2h edges with HDRF scoring seeded by the NE++ state.
  *
  * `HEP-x` in the paper means `tau = x`; [[name]] follows that convention.
  *
  * @param tau      degree threshold factor: `d(v) > tau * meanDegree` ⇒ high
  * @param lambda   HDRF balance weight for the streaming phase
  * @param alphaCap balancing constraint `alpha` for the streaming phase
  */
final class Hep(
    val tau: Double,
    lambda: Double = HdrfScoring.DefaultLambda,
    alphaCap: Double = 1.05,
) extends EdgePartitioner {

  override def name: String = {
    val t = if (tau == tau.floor && tau < 1e6) tau.toLong.toString else tau.toString
    s"HEP-$t"
  }

  override def partition(g: GraphData, k: Int): PartitionResult =
    partitionDetailed(g, k).result

  /** Full run, additionally exposing the CSR (pruning stats, memory model)
    * and the per-partition replica bitsets for tests and benches.
    */
  def partitionDetailed(g: GraphData, k: Int): Hep.Detailed = {
    val t0 = System.nanoTime()
    val csr = PrunedCsr.build(g, Some(tau))
    val pids = Array.fill(g.nE)(-1)
    val loads = new Array[Long](k)
    val replicas = Array.fill(k)(new DenseBitset(g.nV))
    new NePlusPlus(csr, k, pids, loads, replicas, EdgeRemoval.Lazy).run()
    new InformedStreaming(g, k, pids, loads, replicas, lambda, alphaCap).run(csr.h2hEdgeIds)
    val ms = (System.nanoTime() - t0) / 1000000L
    Hep.Detailed(
      PartitionResult(k, pids, name, ms, Some(csr.memoryFootprintBytes(k))),
      csr, replicas)
  }
}

object Hep {
  /** Result bundle of [[Hep.partitionDetailed]]. */
  final case class Detailed(
      result: PartitionResult,
      csr: PrunedCsr,
      replicas: Array[DenseBitset],
  )
}
