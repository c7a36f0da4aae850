package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.{PropHelper, TestGraphs}

object NePlusPlusSpec {
  /** Run the in-memory phase alone; returns the mutated state. */
  def runPhase(g: GraphData, k: Int, tau: Option[Double],
          removal: EdgeRemoval = EdgeRemoval.Lazy)
      : (Array[Int], Array[Long], Array[DenseBitset], PrunedCsr) = {
    val csr = PrunedCsr.build(g, tau)
    val pids = Array.fill(g.nE)(-1)
    val loads = new Array[Long](k)
    val replicas = Array.fill(k)(new DenseBitset(g.nV))
    new NePlusPlus(csr, k, pids, loads, replicas, removal).run()
    (pids, loads, replicas, csr)
  }

  /** Replication factor from raw pids, ignoring unassigned (-1) edges. */
  def rf(g: GraphData, pids: Array[Int], k: Int): Double = {
    val seen = Array.fill(k)(new DenseBitset(g.nV))
    (0 until g.nE).foreach { e =>
      if (pids(e) >= 0) { seen(pids(e)).set(g.src(e)); seen(pids(e)).set(g.dst(e)) }
    }
    seen.map(_.cardinality.toLong).sum.toDouble / g.nV
  }
}

class NePlusPlusSpec extends AnyFunSuite with PropHelper {
  import NePlusPlusSpec._

  private def assertInMemValid(g: GraphData, k: Int, pids: Array[Int], csr: PrunedCsr): Unit = {
    val h2h = csr.h2hEdgeIds.toSet
    (0 until g.nE).foreach { e =>
      if (h2h.contains(e)) assert(pids(e) == -1, s"h2h edge $e must stay unassigned")
      else assert(pids(e) >= 0 && pids(e) < k, s"in-mem edge $e has pid ${pids(e)}")
    }
  }

  test("assigns every in-memory edge exactly once (lazy, unpruned)") {
    val g = TestGraphs.random(50, 200, seed = 1)
    val (pids, _, _, csr) = runPhase(g, 4, None)
    assertInMemValid(g, 4, pids, csr)
  }

  test("assigns every in-memory edge exactly once (lazy, pruned)") {
    val g = TestGraphs.powerLaw(120, 600, gamma = 3.0, seed = 2)
    val (pids, _, _, csr) = runPhase(g, 4, Some(1.0))
    assert(csr.h2hEdgeIds.nonEmpty, "test graph should produce h2h edges at tau=1")
    assertInMemValid(g, 4, pids, csr)
  }

  test("assigns every edge exactly once (eager / NE baseline mode)") {
    val g = TestGraphs.random(50, 200, seed = 3)
    val (pids, _, _, csr) = runPhase(g, 4, None, EdgeRemoval.Eager)
    assertInMemValid(g, 4, pids, csr)
  }

  test("loads sum to the in-memory edge count") {
    val g = TestGraphs.powerLaw(100, 500, gamma = 3.0, seed = 4)
    val (_, loads, _, csr) = runPhase(g, 8, Some(1.0))
    assert(loads.sum == csr.inMemEdgeCount)
  }

  test("partition loads respect the adapted capacity bound (pre-last partitions)") {
    val g = TestGraphs.random(80, 400, seed = 5)
    val k = 4
    val (_, loads, _, csr) = runPhase(g, k, None)
    val cap = (csr.inMemEdgeCount + k - 1) / k
    (0 until k - 1).foreach(p => assert(loads(p) <= cap, s"partition $p"))
  }

  test("replica bitsets match the vertices actually covered by assignments") {
    val g = TestGraphs.powerLaw(90, 350, gamma = 3.0, seed = 6)
    val k = 4
    val (pids, _, replicas, _) = runPhase(g, k, Some(1.5))
    val expected = Array.fill(k)(new DenseBitset(g.nV))
    (0 until g.nE).foreach { e =>
      if (pids(e) >= 0) { expected(pids(e)).set(g.src(e)); expected(pids(e)).set(g.dst(e)) }
    }
    (0 until k).foreach { p =>
      (0 until g.nV).foreach { v =>
        assert(replicas(p).get(v) == expected(p).get(v), s"partition $p vertex $v")
      }
    }
  }

  test("path graph at k=2: near-minimal replication (one cut vertex)") {
    val g = TestGraphs.path(40)
    val (pids, _, _, _) = runPhase(g, 2, None)
    // a path split in two contiguous halves replicates at most 1 vertex
    assert(rf(g, pids, 2) <= (40.0 + 2) / 40)
  }

  test("star graph: hub is replicated, leaves are not") {
    val g = TestGraphs.star(30)
    val k = 3
    val (pids, _, _, _) = runPhase(g, k, None)
    // every leaf has degree 1: replicated exactly once; only the hub repeats
    assert(rf(g, pids, k) <= (31.0 + k - 1) / 31)
  }

  test("disconnected components are all partitioned (re-initialisation)") {
    val g = TestGraphs.twoCliques(8)
    val (pids, _, _, csr) = runPhase(g, 4, None)
    assertInMemValid(g, 4, pids, csr)
  }

  test("lazy clean-up empties the column regions of core-adjacent structure") {
    val g = TestGraphs.random(40, 150, seed = 7)
    val (_, _, _, csr) = runPhase(g, 4, None)
    // after the full run every in-memory edge is assigned; remaining valid
    // entries may only belong to the *last* partition's perspective — but the
    // engine never removes Algorithm-3 entries, so we only assert that no
    // entry references an edge assigned before the last partition twice.
    // Stronger invariant (no double assignment) is already enforced by the
    // engine's internal require; here we check the run completed.
    assert(csr.inMemEdgeCount == g.nE)
  }

  test("NE (eager) and NE++ (lazy) reach near-identical quality on the same input") {
    val g = TestGraphs.powerLaw(300, 1500, gamma = 3.0, seed = 8)
    val k = 8
    val (pLazy, _, _, _) = runPhase(g, k, None, EdgeRemoval.Lazy)
    val (pEager, _, _, _) = runPhase(g, k, None, EdgeRemoval.Eager)
    val rfL = rf(g, pLazy, k); val rfE = rf(g, pEager, k)
    assert(math.abs(rfL - rfE) / rfE < 0.1,
      s"lazy rf=$rfL vs eager rf=$rfE diverge by more than 10%")
  }

  test("k=1 assigns everything to partition 0") {
    val g = TestGraphs.random(20, 60, seed = 9)
    val (pids, loads, _, _) = runPhase(g, 1, None)
    assert(pids.forall(_ == 0) && loads(0) == g.nE)
  }

  test("high-degree vertices never enter the core set") {
    val g = TestGraphs.powerLaw(150, 700, gamma = 3.5, seed = 10)
    val csr = PrunedCsr.build(g, Some(1.0))
    val pids = Array.fill(g.nE)(-1)
    val loads = new Array[Long](4)
    val replicas = Array.fill(4)(new DenseBitset(g.nV))
    val engine = new NePlusPlus(csr, 4, pids, loads, replicas, EdgeRemoval.Lazy)
    engine.run()
    // core size can never exceed the number of low-degree vertices
    assert(engine.coreSize <= (0 until g.nV).count(v => !csr.isHigh(v)))
  }

  test("property: validity holds on random graphs across k and tau") {
    val gen = for {
      nV <- Gen.choose(10, 120)
      nE <- Gen.choose(nV / 2, nV * 4)
      k <- Gen.oneOf(2, 3, 4, 8)
      tau <- Gen.oneOf(Option.empty[Double], Some(0.5), Some(1.0), Some(2.0))
      seed <- Gen.choose(0L, 10000L)
    } yield (nV, nE, k, tau, seed)
    checkProp(Prop.forAll(gen) { case (nV, nE, k, tau, seed) =>
      val g = TestGraphs.random(nV, nE, seed)
      val (pids, loads, _, csr) = runPhase(g, k, tau)
      val h2h = csr.h2hEdgeIds.toSet
      val allAssigned = (0 until g.nE).forall { e =>
        if (h2h.contains(e)) pids(e) == -1 else pids(e) >= 0 && pids(e) < k
      }
      allAssigned && loads.sum == csr.inMemEdgeCount
    }, minTests = 40)
  }

  test("property: validity holds on power-law graphs (pruning active)") {
    val gen = for {
      k <- Gen.oneOf(2, 4, 8)
      tau <- Gen.oneOf(0.3, 1.0, 3.0)
      seed <- Gen.choose(0L, 10000L)
    } yield (k, tau, seed)
    checkProp(Prop.forAll(gen) { case (k, tau, seed) =>
      val g = TestGraphs.powerLaw(150, 600, gamma = 3.2, seed = seed)
      val (pids, loads, _, csr) = runPhase(g, k, Some(tau))
      val h2h = csr.h2hEdgeIds.toSet
      (0 until g.nE).forall { e =>
        if (h2h.contains(e)) pids(e) == -1 else pids(e) >= 0 && pids(e) < k
      } && loads.sum == csr.inMemEdgeCount
    }, minTests = 40)
  }
}
