package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, SparkSpec}
import repro.graphgen.GraphGen

class WeightedGraphSpec extends SparkSpec {

  private def triangle: WeightedGraph =
    WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 2.0), (1, 2, 3.0), (0, 2, 5.0)))

  test("triangle: node and edge counts") {
    val g = triangle
    assert(g.n == 3)
    assert(g.m == 3)
    assert(g.directedEdgeCount == 6)
  }

  test("triangle: weighted degrees") {
    val g = triangle
    assert(g.deg(0) == 7.0)
    assert(g.deg(1) == 5.0)
    assert(g.deg(2) == 8.0)
  }

  test("triangle: total weight is twice the undirected sum") {
    assert(triangle.totalWeight == 20.0)
  }

  test("triangle: neighborhood sizes") {
    val g = triangle
    (0 until 3).foreach(u => assert(g.nbrCount(u) == 2))
  }

  test("triangle: weightOf is symmetric") {
    val g = triangle
    assert(g.weightOf(0, 1) == 2.0 && g.weightOf(1, 0) == 2.0)
    assert(g.weightOf(1, 2) == 3.0 && g.weightOf(2, 1) == 3.0)
    assert(g.weightOf(0, 2) == 5.0 && g.weightOf(2, 0) == 5.0)
  }

  test("weightOf returns 0 for absent edges") {
    val g = WeightedGraph.fromUndirectedEdges(4, Seq((0, 1, 1.0), (2, 3, 1.0)))
    assert(g.weightOf(0, 2) == 0.0)
    assert(g.weightOf(1, 3) == 0.0)
  }

  test("sumSqrtWeights matches direct computation") {
    val g = triangle
    val want = 2 * (math.sqrt(2.0) + math.sqrt(3.0) + math.sqrt(5.0))
    assert(math.abs(g.sumSqrtWeights - want) < 1e-12)
  }

  test("sumSqrtWeightsPerNode matches direct computation") {
    val g = triangle
    assert(math.abs(g.sumSqrtWeightsPerNode(0) - (math.sqrt(2.0) + math.sqrt(5.0))) < 1e-12)
    assert(math.abs(g.sumSqrtWeightsPerNode(1) - (math.sqrt(2.0) + math.sqrt(3.0))) < 1e-12)
    assert(math.abs(g.sumSqrtWeightsPerNode(2) - (math.sqrt(3.0) + math.sqrt(5.0))) < 1e-12)
  }

  test("srcOf recovers the source of every directed edge") {
    val g = GraphGen.randomGraph(30, 0.2, seed = 5)
    var u = 0
    while (u < g.n) {
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) { assert(g.srcOf(e) == u); e += 1 }
      u += 1
    }
  }

  test("isolated nodes are preserved with degree 0") {
    val g = WeightedGraph.fromUndirectedEdges(5, Seq((0, 1, 1.0)))
    assert(g.deg(2) == 0.0 && g.deg(3) == 0.0 && g.deg(4) == 0.0)
    assert(g.nbrCount(2) == 0)
  }

  test("self-loops are rejected") {
    intercept[IllegalArgumentException] {
      WeightedGraph.fromUndirectedEdges(3, Seq((1, 1, 1.0)))
    }
  }

  test("non-positive weights are rejected") {
    intercept[IllegalArgumentException] {
      WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 0.0)))
    }
    intercept[IllegalArgumentException] {
      WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, -2.0)))
    }
  }

  test("out-of-range node ids are rejected") {
    intercept[IllegalArgumentException] {
      WeightedGraph.fromUndirectedEdges(3, Seq((0, 3, 1.0)))
    }
  }

  test("sampleSourcesByDegree only returns positive-degree nodes") {
    val g = WeightedGraph.fromUndirectedEdges(6, Seq((0, 1, 1.0), (1, 2, 1.0)))
    val srcs = g.sampleSourcesByDegree(200, seed = 1)
    assert(srcs.forall(s => g.deg(s) > 0))
  }

  test("sampleSourcesByDegree is deterministic in the seed") {
    val g = GraphGen.randomGraph(40, 0.15, seed = 9)
    assert(g.sampleSourcesByDegree(10, 3).toSeq == g.sampleSourcesByDegree(10, 3).toSeq)
    assert(g.sampleSourcesByDegree(10, 3).toSeq != g.sampleSourcesByDegree(10, 4).toSeq)
  }

  test("sampleSourcesByDegree is degree-biased") {
    // star: center has degree n-1, leaves degree 1 — center should dominate.
    val n = 21
    val edges = (1 until n).map(v => (0, v, 1.0))
    val g = WeightedGraph.fromUndirectedEdges(n, edges)
    val srcs = g.sampleSourcesByDegree(1000, seed = 2)
    val centerFrac = srcs.count(_ == 0).toDouble / srcs.length
    assert(centerFrac > 0.4 && centerFrac < 0.6, s"centerFrac=$centerFrac (expect ~0.5)")
  }

  test("toEdgeDF emits both orientations of every edge") {
    val g = triangle
    val df = g.toEdgeDF(spark)
    assert(df.count() == 6)
    val rows = df.collect().map(r => (r.getLong(0), r.getLong(1), r.getDouble(2))).toSet
    assert(rows.contains((0L, 1L, 2.0)) && rows.contains((1L, 0L, 2.0)))
  }

  test("fromEdgeDF round-trips a CSR graph") {
    val g = GraphGen.randomGraph(25, 0.2, seed = 11)
    val g2 = WeightedGraph.fromEdgeDF(g.toEdgeDF(spark), g.n)
    assert(g2.n == g.n && g2.m == g.m)
    assert(math.abs(g2.totalWeight - g.totalWeight) < 1e-9)
    (0 until g.n).foreach(u => assert(math.abs(g2.deg(u) - g.deg(u)) < 1e-9))
  }

  test("oracle: weighted degrees via DuckDB SQL") {
    import org.apache.spark.sql.functions._
    val g = GraphGen.randomGraph(20, 0.25, seed = 13)
    val edges = g.toEdgeDF(spark)
    val sparkDeg = edges.groupBy(col("src").as("node"))
      .agg(sum("weight").as("deg"))
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT src AS node, sum(CAST(weight AS DOUBLE)) AS deg FROM edges GROUP BY src",
      "edges" -> edges)
  }

  test("oracle: total weight via DuckDB SQL") {
    import org.apache.spark.sql.functions._
    val g = GraphGen.randomGraph(20, 0.25, seed = 13)
    val edges = g.toEdgeDF(spark)
    val sparkTotal = edges.agg(sum("weight").as("total"))
    Oracle.assertEquivalent(
      sparkTotal,
      "SELECT sum(CAST(weight AS DOUBLE)) AS total FROM edges",
      "edges" -> edges)
  }
}
