package repro.motif

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graph.WeightedGraph
import repro.graphgen.GraphGen

class MotifWeightsSpec extends SparkSpec {

  private def unitGraph(n: Int, edges: Seq[(Int, Int)]): WeightedGraph =
    WeightedGraph.fromUndirectedEdges(n, edges.map { case (u, v) => (u, v, 1.0) })

  test("seq: K4 — every edge is in exactly 2 triangles") {
    val k4 = unitGraph(4, for (i <- 0 until 4; j <- i + 1 until 4) yield (i, j))
    val w = MotifWeights.weightsSeq(k4)
    assert(w.size == 6)
    assert(w.values.forall(_ == 2L))
  }

  test("seq: triangle — every edge in exactly 1 triangle") {
    val tri = unitGraph(3, Seq((0, 1), (1, 2), (0, 2)))
    val w = MotifWeights.weightsSeq(tri)
    assert(w == Map((0, 1) -> 1L, (1, 2) -> 1L, (0, 2) -> 1L))
  }

  test("seq: 4-cycle has no triangles") {
    val c4 = unitGraph(4, Seq((0, 1), (1, 2), (2, 3), (0, 3)))
    assert(MotifWeights.weightsSeq(c4).isEmpty)
  }

  test("seq: triangle with a pendant edge — pendant edge dropped") {
    val g = unitGraph(4, Seq((0, 1), (1, 2), (0, 2), (2, 3)))
    val w = MotifWeights.weightsSeq(g)
    assert(!w.contains((2, 3)))
    assert(w((0, 1)) == 1L)
  }

  test("motifWeightedGraph keeps id space, drops triangle-free edges") {
    val g = unitGraph(5, Seq((0, 1), (1, 2), (0, 2), (3, 4)))
    val mg = MotifWeights.motifWeightedGraph(g)
    assert(mg.n == 5)
    assert(mg.m == 3)
    assert(mg.deg(3) == 0 && mg.deg(4) == 0)
  }

  test("DF agrees with seq on K5") {
    val k5 = unitGraph(5, for (i <- 0 until 5; j <- i + 1 until 5) yield (i, j))
    val edges = MotifWeights.canonicalEdgesDF(spark, k5)
    val df = MotifWeights.weightsDF(spark, edges).collect()
      .map(r => ((r.getLong(0).toInt, r.getLong(1).toInt), r.getLong(2))).toMap
    assert(df == MotifWeights.weightsSeq(k5))
  }

  for (seed <- 1 to 4)
    test(s"DF agrees with seq on random graph (seed=$seed)") {
      val g = GraphGen.randomGraph(40, 0.15, seed)
      val edges = MotifWeights.canonicalEdgesDF(spark, g)
      val df = MotifWeights.weightsDF(spark, edges).collect()
        .map(r => ((r.getLong(0).toInt, r.getLong(1).toInt), r.getLong(2))).toMap
      assert(df == MotifWeights.weightsSeq(g))
    }

  test("oracle: DataFrame triangle counting matches DuckDB SQL") {
    val g = GraphGen.randomGraph(35, 0.2, seed = 8)
    val edges = MotifWeights.canonicalEdgesDF(spark, g)
    val sparkPhi = MotifWeights.weightsDF(spark, edges)
      .select(col("a"), col("b"), col("phi"))
    Oracle.assertEquivalent(
      sparkPhi,
      """
        |WITH e AS (SELECT CAST(a AS BIGINT) AS a, CAST(b AS BIGINT) AS b FROM edges),
        |tri AS (
        |  SELECT e1.a AS x, e1.b AS y, e2.b AS z
        |  FROM e e1 JOIN e e2 ON e1.a = e2.a AND e1.b < e2.b
        |  JOIN e e3 ON e3.a = e1.b AND e3.b = e2.b
        |),
        |contrib AS (
        |  SELECT x AS a, y AS b FROM tri
        |  UNION ALL SELECT x, z FROM tri
        |  UNION ALL SELECT y, z FROM tri
        |)
        |SELECT a, b, count(*) AS phi FROM contrib GROUP BY a, b
        |""".stripMargin,
      "edges" -> edges)
  }

  test("motif weights on chungLu graph: some edges survive with weight >= 1") {
    val g = GraphGen.chungLu(600, 12, 2.2, seed = 21)
    val mg = MotifWeights.motifWeightedGraph(g)
    assert(mg.m > 0)
    assert(mg.wgt.forall(_ >= 1.0))
    assert(mg.m <= g.m)
  }
}
