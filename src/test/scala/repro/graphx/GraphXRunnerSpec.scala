package repro.graphx

import org.apache.spark.graphx.Graph
import repro.{SparkSpec, TestGraphs}
import repro.core.{GraphData, Hep, PartitionResult}

class GraphXRunnerSpec extends SparkSpec {

  private def partitioned(g: GraphData, k: Int): (PartitionResult, Graph[Int, Int]) = {
    val res = new Hep(1.0).partition(g, k)
    (res, GraphXRunner.buildGraph(spark, g, res))
  }

  test("buildGraph preserves the edge multiset") {
    val g = TestGraphs.random(30, 100, seed = 70)
    val (_, graph) = partitioned(g, 4)
    assert(graph.edges.count() == g.nE)
    val got = graph.edges.map(e => (e.srcId, e.dstId)).collect().toSet
    val want = (0 until g.nE).map(e => (g.src(e).toLong, g.dst(e).toLong)).toSet
    assert(got == want)
  }

  test("GraphX partition p holds exactly the edges our partitioner assigned to p") {
    val g = TestGraphs.random(30, 100, seed = 71)
    val (res, graph) = partitioned(g, 4)
    val byPartition = graph.edges.mapPartitionsWithIndex { (pid, it) =>
      it.map(e => (pid, (e.srcId.toInt, e.dstId.toInt)))
    }.collect().groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    val want = (0 until g.nE).groupBy(res.pids).view
      .mapValues(_.map(e => (g.src(e), g.dst(e))).toSet).toMap
    (0 until 4).foreach { p =>
      assert(byPartition.getOrElse(p, Set.empty) == want.getOrElse(p, Set.empty), s"partition $p")
    }
  }

  test("identity partitioner routes keys verbatim") {
    val p = new GraphXRunner.IdentityPartitioner(8)
    assert(p.numPartitions == 8)
    (0 until 8).foreach(i => assert(p.getPartition(i) == i))
  }

  test("PageRank runs and produces positive ranks for every vertex") {
    val g = TestGraphs.powerLaw(60, 250, gamma = 3.0, seed = 72)
    val (_, graph) = partitioned(g, 4)
    val ranks = graph.staticPageRank(5).vertices.collect()
    assert(ranks.length == graph.vertices.count())
    assert(ranks.forall(_._2 > 0.0))
  }

  test("BFS distances match a driver-side reference BFS") {
    val g = TestGraphs.random(40, 90, seed = 73)
    val (_, graph) = partitioned(g, 4)
    val seed = 0L
    val got = GraphXRunner.bfsDistances(graph, seed).vertices.collect().toMap

    // reference BFS over the undirected adjacency
    val adj = Array.fill(g.nV)(List.empty[Int])
    (0 until g.nE).foreach { e =>
      adj(g.src(e)) = g.dst(e) :: adj(g.src(e))
      adj(g.dst(e)) = g.src(e) :: adj(g.dst(e))
    }
    val dist = Array.fill(g.nV)(Int.MaxValue)
    dist(seed.toInt) = 0
    val q = scala.collection.mutable.Queue(seed.toInt)
    while (q.nonEmpty) {
      val v = q.dequeue()
      adj(v).foreach { u =>
        if (dist(u) == Int.MaxValue) { dist(u) = dist(v) + 1; q.enqueue(u) }
      }
    }
    got.foreach { case (vid, d) =>
      assert(d == dist(vid.toInt), s"vertex $vid")
    }
  }

  test("BFS from an isolated seed leaves the rest unreached") {
    val g = GraphData.fromEdges(4, Seq((0, 1), (2, 3)))
    val res = PartitionResult(2, Array(0, 1), "manual", 0)
    val graph = GraphXRunner.buildGraph(spark, g, res)
    val got = GraphXRunner.bfsDistances(graph, 0L).vertices.collect().toMap
    assert(got(0L) == 0 && got(1L) == 1)
    assert(got(2L) == Int.MaxValue && got(3L) == Int.MaxValue)
  }

  test("connected components match a driver-side union-find") {
    val g = TestGraphs.twoCliques(5)
    val (_, graph) = partitioned(g, 2)
    val cc = graph.connectedComponents().vertices.collect().toMap
    // union-find reference
    val parent = Array.tabulate(g.nV)(identity)
    def find(x: Int): Int = if (parent(x) == x) x else { parent(x) = find(parent(x)); parent(x) }
    (0 until g.nE).foreach { e =>
      val (a, b) = (find(g.src(e)), find(g.dst(e)))
      if (a != b) parent(math.max(a, b)) = math.min(a, b)
    }
    val refGroups = (0 until g.nV).groupBy(find).values.map(_.toSet).toSet
    val gotGroups = cc.toSeq.groupBy(_._2).values.map(_.map(_._1.toInt).toSet).toSet
    assert(gotGroups == refGroups)
  }

  test("default seeds are in range and distinct enough") {
    val seeds = GraphXRunner.defaultSeeds(1000, 5)
    assert(seeds.length == 5)
    assert(seeds.forall(s => s >= 0 && s < 1000))
    assert(seeds.distinct.length == 5)
  }

  test("run returns timings for all three workloads") {
    val g = TestGraphs.powerLaw(50, 200, gamma = 3.0, seed = 74)
    val res = new Hep(1.0).partition(g, 4)
    val t = GraphXRunner.run(spark, g, res, prIters = 2,
      GraphXRunner.defaultSeeds(g.nV, 2))
    assert(t.pageRankMs >= 0 && t.bfsMs >= 0 && t.ccMs >= 0)
  }
}
