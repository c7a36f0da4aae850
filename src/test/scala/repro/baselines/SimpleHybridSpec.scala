package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.{Hep, Partitioners, PrunedCsr}

/** The Section 5.4 simple-hybrid baseline (NE on G_REST + random streaming
  * on G_H2H).
  */
class SimpleHybridSpec extends AnyFunSuite {

  test("produces a valid partitioning") {
    val g = TestGraphs.powerLaw(150, 700, gamma = 3.2, seed = 60)
    for (k <- Seq(2, 4, 8)) Partitioners.validate(g, new SimpleHybrid(1.0).partition(g, k))
  }

  test("name embeds tau") {
    assert(new SimpleHybrid(10).name == "SimpleHybrid-10")
  }

  test("splits the edge set exactly like HEP's CSR pruning") {
    val g = TestGraphs.powerLaw(150, 700, gamma = 3.2, seed = 61)
    val csr = PrunedCsr.build(g, Some(1.0))
    // the baseline and HEP must agree on which edges are h2h; we verify by
    // checking the count of edges whose endpoints are both high-degree
    val mean = g.meanDegree
    val h2h = (0 until g.nE).count { e =>
      g.degrees(g.src(e)) > mean && g.degrees(g.dst(e)) > mean
    }
    assert(csr.h2hEdgeIds.length == h2h)
  }

  test("HEP beats the simple hybrid on replication factor at low tau") {
    // Figure 9(q)-style claim: with much of the graph streamed (tau = 1),
    // informed HDRF crushes random streaming on quality.
    val g = TestGraphs.powerLaw(400, 2000, gamma = 3.2, seed = 62)
    val k = 8
    val rfHep = Partitioners.replicationFactor(g, new Hep(0.5).partition(g, k))
    val rfSimple = Partitioners.replicationFactor(g, new SimpleHybrid(0.5).partition(g, k))
    assert(rfHep < rfSimple, s"HEP $rfHep vs simple hybrid $rfSimple")
  }

  test("works when nothing is high-degree") {
    val g = TestGraphs.path(30)
    val res = new SimpleHybrid(100).partition(g, 3)
    Partitioners.validate(g, res)
  }

  test("works when everything is h2h") {
    val g = TestGraphs.twoCliques(6)
    val res = new SimpleHybrid(0.1).partition(g, 3)
    Partitioners.validate(g, res)
  }

  test("deterministic") {
    val g = TestGraphs.powerLaw(100, 400, gamma = 3.0, seed = 63)
    assert(new SimpleHybrid(1.0).partition(g, 4).pids.toSeq ==
           new SimpleHybrid(1.0).partition(g, 4).pids.toSeq)
  }
}
