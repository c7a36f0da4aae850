package repro.harness

import repro.{SparkSpec, SynthGraphs, TestGraphs}

/** Smoke + structure tests of the per-table harnesses at miniature scale
  * (the full-size runs live in `bench/`).
  */
class TableHarnessSpec extends SparkSpec {

  private lazy val tiny = Seq(SynthGraphs.ljProxy(spark, scale = 0.1))

  test("table1 covers every partitioner, k, and edge scale") {
    val g = TestGraphs.powerLaw(150, 600, gamma = 3.0, seed = 120)
    val rows = TableHarness.table1(g, ks = Seq(2, 4))
    val algos = TableHarness.allPartitioners().map(_.name).toSet
    assert(rows.map(_.algo).toSet == algos)
    assert(rows.map(_.k).toSet == Set(2, 4))
    assert(rows.map(_.nE).toSet == Set(g.nE, g.nE / 2))
    assert(rows.forall(_.millis >= 0))
  }

  test("table2 reports a runtime and a footprint grid per graph") {
    val rows = TableHarness.table2(spark, tiny, k = 4, taus = Seq(10, 1))
    assert(rows.length == 1)
    assert(rows.head.footprints.map(_.tau) == Seq(10.0, 1.0))
    assert(rows.head.millis >= 0)
  }

  test("table3 reports Table 3's columns for each proxy") {
    val rows = TableHarness.table3(tiny)
    val r = rows.head
    assert(r.graph == "LJ-proxy" && r.kind == "Social")
    assert(r.sizeBytes == r.nE * 8)
    assert(r.nV > 0 && r.nE > 0)
  }

  test("table4 produces one row per (graph, partitioner) with sane metrics") {
    val rows = TableHarness.table4(spark, tiny, k = 4, prIters = 2, nSeeds = 1,
      partitioners = Seq(new repro.core.Hep(10), new repro.baselines.Dbh()))
    assert(rows.length == 2)
    rows.foreach { r =>
      assert(r.rf >= 1.0, s"${r.algo} rf=${r.rf}")
      assert(r.prMs >= 0 && r.bfsMs >= 0 && r.ccMs >= 0)
    }
    val byAlgo = rows.map(r => r.algo -> r.rf).toMap
    assert(byAlgo("HEP-10") < byAlgo("DBH"))
  }

  test("table5 covers the three tau settings") {
    val rows = TableHarness.table5(spark, tiny, k = 4, taus = Seq(100, 1))
    assert(rows.map(_.algo) == Seq("HEP-100", "HEP-1"))
    assert(rows.forall(_.stdOverAvg >= 0.0))
  }

  test("table6 fault counts grow as the memory limit shrinks") {
    val (rows, baseMs) = TableHarness.table6(tiny.head, k = 4, tau = 100.0,
      memLimits = Seq(8L * 1024 * 1024, 256L * 1024))
    assert(baseMs >= 0)
    assert(rows.head.faults <= rows.last.faults,
      s"8MB faults=${rows.head.faults} vs 256KB faults=${rows.last.faults}")
    assert(rows.forall(_.modelledMs >= 0))
  }

  test("render produces aligned columns") {
    val out = TableHarness.render(Seq(Seq("a", "bb"), Seq("ccc", "d")))
    val lines = out.split("\n")
    assert(lines.length == 2)
    assert(lines(0).length == lines(1).length)
  }

  test("render of nothing is empty") {
    assert(TableHarness.render(Nil) == "")
  }
}
