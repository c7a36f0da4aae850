package repro.core

/** The HDRF scoring function of Petroni et al. (CIKM'15), shared by HEP's
  * informed streaming phase (Section 3.3) and the standalone HDRF baseline.
  *
  * `score(e=(u,v), p) = C_REP + C_BAL` with
  *  - `C_REP = g(u) + g(v)`, `g(x) = 1 + (1 - θ(x))` if x is already
  *    replicated on p else 0, `θ(u) = d(u) / (d(u) + d(v))`;
  *  - `C_BAL = λ * (maxLoad - load(p)) / (ε + maxLoad - minLoad)`.
  *
  * The paper's recommended `λ = 1.1` is the default everywhere.
  */
object HdrfScoring {
  val DefaultLambda = 1.1
  private val Eps = 1e-3

  def score(
      degU: Long, degV: Long,
      replicatedU: Boolean, replicatedV: Boolean,
      load: Long, minLoad: Long, maxLoad: Long,
      lambda: Double,
  ): Double = {
    val thetaU = if (degU + degV == 0) 0.5 else degU.toDouble / (degU + degV)
    val thetaV = 1.0 - thetaU
    val gU = if (replicatedU) 1.0 + (1.0 - thetaU) else 0.0
    val gV = if (replicatedV) 1.0 + (1.0 - thetaV) else 0.0
    val bal = lambda * (maxLoad - load).toDouble / (Eps + (maxLoad - minLoad).toDouble)
    gU + gV + bal
  }
}

/** Informed stateful streaming partitioning (Algorithm 4): places the h2h
  * edge stream with HDRF scoring, *seeded* with the NE++ phase's state — the
  * true vertex degrees from graph building, the per-partition replica sets
  * and the per-partition edge loads. This is how HEP escapes the
  * "uninformed assignment problem" of cold-started streaming partitioners.
  *
  * Mutates `pids`, `loads`, `replicas` in place, honouring the balancing
  * constraint `|p_i| <= ceil(alphaCap * |E| / k)` (candidates at capacity are
  * skipped; if every partition is full the least-loaded one is used).
  */
final class InformedStreaming(
    g: GraphData,
    k: Int,
    pids: Array[Int],
    loads: Array[Long],
    replicas: Array[DenseBitset],
    lambda: Double = HdrfScoring.DefaultLambda,
    alphaCap: Double = 1.05,
) {
  require(k >= 1 && alphaCap >= 1.0, s"invalid k=$k / alphaCap=$alphaCap")

  private val capacity: Long = math.ceil(alphaCap * g.nE / k.toDouble).toLong

  /** Stream the given edge ids (HEP passes the CSR's h2h buffer). */
  def run(edgeIds: Array[Int]): Unit = {
    val deg = g.degrees
    var i = 0
    while (i < edgeIds.length) {
      val eid = edgeIds(i)
      val u = g.src(eid); val v = g.dst(eid)
      var minLoad = Long.MaxValue; var maxLoad = Long.MinValue
      var p = 0
      while (p < k) {
        if (loads(p) < minLoad) minLoad = loads(p)
        if (loads(p) > maxLoad) maxLoad = loads(p)
        p += 1
      }
      var best = -1
      var bestScore = Double.NegativeInfinity
      p = 0
      while (p < k) {
        if (loads(p) < capacity) {
          val s = HdrfScoring.score(deg(u), deg(v),
            replicas(p).get(u), replicas(p).get(v),
            loads(p), minLoad, maxLoad, lambda)
          if (s > bestScore) { bestScore = s; best = p }
        }
        p += 1
      }
      if (best < 0) { // every partition at capacity: fall back to least loaded
        var q = 0
        while (q < k) { if (best < 0 || loads(q) < loads(best)) best = q; q += 1 }
      }
      require(pids(eid) < 0, s"edge $eid already assigned before streaming")
      pids(eid) = best
      loads(best) += 1
      replicas(best).set(u)
      replicas(best).set(v)
      i += 1
    }
  }
}
