package repro.baselines

import repro.core.{EdgePartitioner, GraphData, PartitionResult}

/** Random streaming assignment (the streaming half of the "simple hybrid"
  * baseline of Section 5.4): each edge goes to a pseudo-random partition,
  * linear-probing past partitions at the balancing capacity. Deterministic
  * in the seed.
  */
final class RandomStreaming(alphaCap: Double = 1.05, seed: Int = 42) extends EdgePartitioner {

  override def name: String = "Random"

  override def partition(g: GraphData, k: Int): PartitionResult = {
    val t0 = System.nanoTime()
    val pids = new Array[Int](g.nE)
    val loads = new Array[Long](k)
    val capacity = math.ceil(alphaCap * g.nE / k.toDouble).toLong
    var e = 0
    while (e < g.nE) {
      var p = Dbh.mix(e ^ seed) % k
      var probes = 0
      while (loads(p) >= capacity && probes < k) { p = (p + 1) % k; probes += 1 }
      pids(e) = p
      loads(p) += 1
      e += 1
    }
    val ms = (System.nanoTime() - t0) / 1000000L
    PartitionResult(k, pids, name, ms)
  }
}
