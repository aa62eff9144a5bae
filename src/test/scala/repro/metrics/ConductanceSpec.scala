package repro.metrics

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graph.WeightedGraph
import repro.graphgen.GraphGen

class ConductanceSpec extends SparkSpec {

  /** Two unit-weight K4 cliques joined by a single bridge edge. */
  private def twoCliques: WeightedGraph = {
    val edges = (for (i <- 0 until 4; j <- i + 1 until 4) yield (i, j, 1.0)) ++
      (for (i <- 4 until 8; j <- i + 1 until 8) yield (i, j, 1.0)) :+ ((3, 4, 1.0))
    WeightedGraph.fromUndirectedEdges(8, edges)
  }

  test("ofSet: one clique of the two-clique graph has tiny conductance") {
    val g = twoCliques
    val phi = Conductance.ofSet(g, Set(0, 1, 2, 3))
    // vol(S) = 3*2*... : each of 0,1,2 has degree 3; node 3 has degree 4 ⇒ vol=13
    // cut = 1 (the bridge). Φ = 1/13.
    assert(math.abs(phi - 1.0 / 13) < 1e-12)
  }

  test("ofSet: empty set has conductance 1") {
    assert(Conductance.ofSet(twoCliques, Set.empty) == 1.0)
  }

  test("ofSet: full set has conductance 1 (degenerate)") {
    assert(Conductance.ofSet(twoCliques, (0 until 8).toSet) == 1.0)
  }

  test("ofSet: single node = d(u)/d(u) when vol < half") {
    val g = twoCliques
    assert(math.abs(Conductance.ofSet(g, Set(0)) - 1.0) < 1e-12)
  }

  test("sweep finds the clique cut from a PPR-like vector") {
    val g = twoCliques
    // a vector concentrated on the first clique
    val pi = Array(0.4, 0.3, 0.2, 0.1, 0.01, 0.0, 0.0, 0.0)
    val (phi, k) = Conductance.sweep(g, pi)
    assert(math.abs(phi - 1.0 / 13) < 1e-12, s"phi=$phi")
    assert(k == 4)
  }

  test("sweep on all-zero vector returns (1, 0)") {
    assert(Conductance.sweep(twoCliques, new Array[Double](8)) == ((1.0, 0)))
  }

  test("sweep conductance matches ofSet on the chosen prefix") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.15, 3), 1.0, seed = 3)
    val rnd = new scala.util.Random(5)
    val pi = Array.fill(g.n)(rnd.nextDouble())
    val (phi, k) = Conductance.sweep(g, pi)
    val order = (0 until g.n).filter(u => pi(u) > 0 && g.deg(u) > 0)
      .sortBy(u => (-pi(u) / g.deg(u), u))
    val prefix = order.take(k).toSet
    assert(math.abs(phi - Conductance.ofSet(g, prefix)) < 1e-9)
  }

  for (seed <- 1 to 5)
    test(s"sweep conductance is within (0, 1] on weighted random graphs (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.2, seed), 0.9, seed = seed)
      val rnd = new scala.util.Random(seed)
      val pi = Array.fill(g.n)(rnd.nextDouble())
      val (phi, k) = Conductance.sweep(g, pi)
      // phi can be 0 up to FP cancellation on heavy-tailed weights
      assert(phi >= 0 && phi <= 1 + 1e-12, s"phi=$phi")
      assert(k > 0)
    }

  test("oracle: cut and volume of a set via DuckDB SQL") {
    val g = twoCliques
    val set = Set(0L, 1L, 2L, 3L)
    val edges = g.toEdgeDF(spark)
    val inSet = udf((x: Long) => set.contains(x))
    val sparkStats = edges
      .agg(
        sum(when(inSet(col("src")) && !inSet(col("dst")), col("weight"))
          .otherwise(0.0)).as("cut"),
        sum(when(inSet(col("src")), col("weight")).otherwise(0.0)).as("vol"))
    Oracle.assertEquivalent(
      sparkStats,
      """
        |SELECT
        |  sum(CASE WHEN CAST(src AS BIGINT) IN (0,1,2,3)
        |            AND CAST(dst AS BIGINT) NOT IN (0,1,2,3)
        |           THEN CAST(weight AS DOUBLE) ELSE 0 END) AS cut,
        |  sum(CASE WHEN CAST(src AS BIGINT) IN (0,1,2,3)
        |           THEN CAST(weight AS DOUBLE) ELSE 0 END) AS vol
        |FROM edges
        |""".stripMargin,
      "edges" -> edges)
  }
}
