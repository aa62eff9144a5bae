package repro.motif

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.WeightedGraph
import repro.graphgen.GraphGen

/** Motif ("clique3" = triangle) based weighting of unweighted graphs — the
  * MAPPR preprocessing the paper applies to YT/LJ/IC/OL (§6, Datasets).
  *
  * The motif weight φ(e) of edge e is the number of triangles containing e;
  * the weighted graph keeps exactly the edges with φ(e) > 0, with weight
  * A_e = φ(e).
  *
  * Two implementations:
  *  - [[weightsDF]]: a Spark SQL pipeline over the canonical edge relation
  *    (self-join to enumerate wedges, join back to close triangles,
  *    explode + aggregate to per-edge counts) — the distributed substrate.
  *  - [[weightsSeq]]: sorted-adjacency intersection on the CSR graph —
  *    the reference used by generators and as a test oracle for the
  *    DataFrame version.
  */
object MotifWeights {

  /** Canonical (a < b) edge relation of an unweighted graph. */
  def canonicalEdgesDF(spark: SparkSession, g: WeightedGraph): DataFrame = {
    import spark.implicits._
    GraphGen.undirectedEdges(g).map { case (u, v, _) => (u.toLong, v.toLong) }
      .toDF("a", "b")
  }

  /** Per-edge triangle counts as a DataFrame (a, b, phi) with a < b and
    * phi > 0. Edges in no triangle are absent from the result.
    */
  def weightsDF(spark: SparkSession, edges: DataFrame): DataFrame = {
    val e = edges.select(col("a").cast("long").as("a"), col("b").cast("long").as("b"))
    // Wedges rooted at the smallest node: (a < b < c) with edges (a,b),(a,c).
    val wedges = e.as("e1")
      .join(e.as("e2"), col("e1.a") === col("e2.a") && col("e1.b") < col("e2.b"))
      .select(col("e1.a").as("x"), col("e1.b").as("y"), col("e2.b").as("z"))
    // Close the triangle with edge (b, c).
    val triangles = wedges
      .join(e.as("e3"), col("y") === col("e3.a") && col("z") === col("e3.b"))
      .select(col("x"), col("y"), col("z"))
    // Each triangle {x<y<z} contributes 1 to each of its three edges.
    triangles
      .select(explode(array(
        struct(col("x").as("a"), col("y").as("b")),
        struct(col("x").as("a"), col("z").as("b")),
        struct(col("y").as("a"), col("z").as("b")),
      )).as("edge"))
      .select(col("edge.a").as("a"), col("edge.b").as("b"))
      .groupBy("a", "b")
      .agg(count(lit(1)).as("phi"))
  }

  /** Per-edge triangle counts on the CSR graph: for each undirected edge
    * (u,v), φ = |N(u) ∩ N(v)| by sorted-array intersection.
    */
  def weightsSeq(g: WeightedGraph): Map[(Int, Int), Long] = {
    val sorted = Array.tabulate(g.n) { u =>
      val s = g.nbr.slice(g.indptr(u), g.indptr(u + 1))
      java.util.Arrays.sort(s); s
    }
    def intersect(x: Array[Int], y: Array[Int]): Long = {
      var i = 0; var j = 0; var c = 0L
      while (i < x.length && j < y.length) {
        if (x(i) == y(j)) { c += 1; i += 1; j += 1 }
        else if (x(i) < y(j)) i += 1
        else j += 1
      }
      c
    }
    val b = Map.newBuilder[(Int, Int), Long]
    GraphGen.undirectedEdges(g).foreach { case (u, v, _) =>
      val c = intersect(sorted(u), sorted(v))
      if (c > 0) b += ((u, v) -> c)
    }
    b.result()
  }

  /** The motif-weighted graph: edges with φ(e) > 0, weight = φ(e). The
    * node-id space is preserved (nodes whose every edge loses its motif
    * weight become isolated, as in MAPPR).
    */
  def motifWeightedGraph(g: WeightedGraph): WeightedGraph = {
    val edges = weightsSeq(g).map { case ((u, v), c) => (u, v, c.toDouble) }.toSeq
    WeightedGraph.fromUndirectedEdges(g.n, edges)
  }
}
