package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}

class GraphDataSpec extends SparkSpec {

  test("degrees count both endpoints of every edge") {
    val g = GraphData.fromEdges(4, Seq((0, 1), (0, 2), (0, 3), (1, 2)))
    assert(g.degrees.toSeq == Seq(3, 2, 2, 1))
  }

  test("mean degree is 2|E|/|V|") {
    val g = TestGraphs.star(5)
    assert(g.meanDegree === 2.0 * 5 / 6)
  }

  test("edge count and binary size") {
    val g = TestGraphs.path(10)
    assert(g.nE == 9)
    assert(g.binaryEdgeListBytes == 9 * 8)
  }

  test("fromEdges preserves edge orientation") {
    val g = GraphData.fromEdges(3, Seq((2, 1), (0, 2)))
    assert(g.src.toSeq == Seq(2, 0) && g.dst.toSeq == Seq(1, 2))
  }

  test("fromDF round-trips a DataFrame edge list") {
    import spark.implicits._
    val df = Seq((0, 1), (1, 2), (2, 3)).toDF("src", "dst")
    val g = GraphData.fromDF(df, 4)
    assert(g.nE == 3 && g.nV == 4)
    assert(g.src.toSeq.sorted == Seq(0, 1, 2))
  }

  test("fromDF accepts long ids within Int range") {
    import spark.implicits._
    val df = Seq((0L, 1L), (1L, 2L)).toDF("src", "dst")
    val g = GraphData.fromDF(df, 3)
    assert(g.degrees.toSeq == Seq(1, 2, 1))
  }

  test("fromDF rejects ids outside the declared vertex range") {
    import spark.implicits._
    val df = Seq((0, 7)).toDF("src", "dst")
    intercept[IllegalArgumentException](GraphData.fromDF(df, 4))
  }

  test("degrees agree with the DuckDB oracle") {
    import spark.implicits._
    val g = TestGraphs.random(30, 60, seed = 5)
    val edges = (0 until g.nE).map(e => (g.src(e), g.dst(e))).toDF("src", "dst")
    val sparkDeg = edges.select($"src".as("v")).union(edges.select($"dst".as("v")))
      .groupBy("v").agg(count(lit(1)).as("deg"))
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT v, COUNT(*) AS deg FROM (SELECT src AS v FROM edges UNION ALL SELECT dst FROM edges) GROUP BY v",
      "edges" -> edges)
    // and the driver-side degrees array matches the DataFrame
    val fromDf = sparkDeg.collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    (0 until g.nV).foreach { v =>
      assert(g.degrees(v).toLong == fromDf.getOrElse(v, 0L), s"vertex $v")
    }
  }

  test("misaligned src/dst arrays are rejected") {
    intercept[IllegalArgumentException](new GraphData(3, Array(0, 1), Array(1)))
  }
}
