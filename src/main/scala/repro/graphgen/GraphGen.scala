package repro.graphgen

import repro.graph.WeightedGraph
import scala.util.Random

/** Deterministic weighted-graph generators used across tests and benches.
  *
  * All generators are pure in (parameters, seed) so the DuckDB oracle and
  * the Spark dataflow implementations see identical graphs.
  */
object GraphGen {

  /** The bad case of Figure 1: a star around node 0 ("u") with n-1 leaves,
    * where edge (u, v1) carries `1 - 1/n` of u's unit degree and the other
    * n-2 leaves share `1/n` evenly; v1 additionally hangs a pendant node
    * "w". Node ids: 0 = u, 1 = v1, 2..n-1 = v2..v_{n-1}, n = w.
    */
  def unbalancedStar(n: Int): WeightedGraph = {
    require(n >= 3, "need at least u, v1, v2")
    val heavy = 1.0 - 1.0 / n
    val light = (1.0 / n) / (n - 2)
    val edges = Seq.newBuilder[(Int, Int, Double)]
    edges += ((0, 1, heavy))
    (2 until n).foreach(v => edges += ((0, v, light)))
    edges += ((1, n, heavy)) // v1 — w pendant edge
    WeightedGraph.fromUndirectedEdges(n + 1, edges.result())
  }

  /** Complete graph on n nodes where every node is (1/n, 1-1/n)-unbalanced:
    * node i's edge to its ring-successor carries almost all of its weight.
    * This is the §5.3 extreme case with cos²φ = Θ(1/n).
    */
  def unbalancedComplete(n: Int): WeightedGraph = {
    require(n >= 3)
    val heavy = 1.0 - 1.0 / n
    val light = (1.0 / n) / (n - 2)
    val edges = Seq.newBuilder[(Int, Int, Double)]
    for (i <- 0 until n; j <- i + 1 until n) {
      val ring = (j == i + 1) || (i == 0 && j == n - 1)
      edges += ((i, j, if (ring) heavy else light))
    }
    WeightedGraph.fromUndirectedEdges(n, edges.result())
  }

  /** Uniform-weight complete graph — the perfectly balanced case
    * (cos²φ = 1), where EdgePush has no advantage over LocalPush.
    */
  def uniformComplete(n: Int): WeightedGraph = {
    val edges = for (i <- 0 until n; j <- i + 1 until n) yield (i, j, 1.0)
    WeightedGraph.fromUndirectedEdges(n, edges)
  }

  /** Chung–Lu style power-law random graph: expected degree of node i is
    * ∝ (i+1)^(-1/(beta-1)), scaled to `avgDeg`. Returns the set of
    * unweighted undirected edges (weight 1.0); weight them afterwards with
    * [[withZipfWeights]] or motif counting. Isolated nodes may remain.
    */
  def chungLu(n: Int, avgDeg: Double, beta: Double = 2.5, seed: Long = 7): WeightedGraph = {
    val rnd = new Random(seed)
    val w = Array.tabulate(n)(i => math.pow(i + 1.0, -1.0 / (beta - 1.0)))
    val wSum = w.sum
    val scale = avgDeg * n / wSum
    var i = 0
    while (i < n) { w(i) *= scale; i += 1 }
    val cum = new Array[Double](n)
    var acc = 0.0
    i = 0
    while (i < n) { acc += w(i); cum(i) = acc; i += 1 }
    def draw(): Int = {
      val x = rnd.nextDouble() * acc
      var lo = 0; var hi = n - 1
      while (lo < hi) { val mid = (lo + hi) >>> 1; if (cum(mid) < x) lo = mid + 1 else hi = mid }
      lo
    }
    // Sample m = avgDeg*n/2 endpoint pairs by weight, dedup, drop self-loops.
    val target = (avgDeg * n / 2).toInt
    val seen = scala.collection.mutable.HashSet.empty[Long]
    val edges = Seq.newBuilder[(Int, Int, Double)]
    var tries = 0
    while (seen.size < target && tries < target * 20) {
      val a = draw(); val b = draw()
      if (a != b) {
        val (u, v) = if (a < b) (a, b) else (b, a)
        val key = u.toLong * n + v
        if (seen.add(key)) edges += ((u, v, 1.0))
      }
      tries += 1
    }
    WeightedGraph.fromUndirectedEdges(n, edges.result())
  }

  /** Re-weight a graph's undirected edges with Pareto(alpha, xm) draws —
    * heavy-tailed like the real weighted datasets (TA/BC/SP in Table 2).
    * Smaller `alpha` ⇒ heavier tail ⇒ smaller cos²φ.
    */
  def withParetoWeights(g: WeightedGraph, alpha: Double, xm: Double = 1.0,
                        seed: Long = 11): WeightedGraph = {
    val rnd = new Random(seed)
    val edges = undirectedEdges(g).map { case (u, v, _) =>
      val w = xm / math.pow(rnd.nextDouble() max 1e-12, 1.0 / alpha)
      (u, v, w)
    }
    WeightedGraph.fromUndirectedEdges(g.n, edges)
  }

  /** Re-weight with near-uniform weights in [1, 1+jitter] — mimics Threads
    * (TH), whose cos²φ = 0.97. */
  def withUniformWeights(g: WeightedGraph, jitter: Double = 0.2, seed: Long = 13): WeightedGraph = {
    val rnd = new Random(seed)
    val edges = undirectedEdges(g).map { case (u, v, _) => (u, v, 1.0 + rnd.nextDouble() * jitter) }
    WeightedGraph.fromUndirectedEdges(g.n, edges)
  }

  /** Overlay `numCliques` cliques of `cliqueSize` random nodes on top of a
    * graph (deduplicating edges). Under clique3 motif weighting the clique
    * edges acquire weights ~cliqueSize while the background stays ~1,
    * mimicking web graphs like IndoChina whose motif weights are severely
    * unbalanced (cos²φ = 0.31 in Table 2).
    */
  def withPlantedCliques(g: WeightedGraph, numCliques: Int, cliqueSize: Int,
                         seed: Long = 31): WeightedGraph = {
    val rnd = new Random(seed)
    val seen = scala.collection.mutable.HashSet.empty[Long]
    val edges = Seq.newBuilder[(Int, Int, Double)]
    undirectedEdges(g).foreach { case (u, v, w) =>
      seen.add(u.toLong * g.n + v)
      edges += ((u, v, w))
    }
    (0 until numCliques).foreach { _ =>
      val members = Array.fill(cliqueSize)(rnd.nextInt(g.n)).distinct
      for (i <- members.indices; j <- i + 1 until members.length) {
        val (u, v) = if (members(i) < members(j)) (members(i), members(j))
                     else (members(j), members(i))
        if (seen.add(u.toLong * g.n + v)) edges += ((u, v, 1.0))
      }
    }
    WeightedGraph.fromUndirectedEdges(g.n, edges.result())
  }

  /** Extract each undirected edge (u < v) once. */
  def undirectedEdges(g: WeightedGraph): Seq[(Int, Int, Double)] = {
    val b = Seq.newBuilder[(Int, Int, Double)]
    var u = 0
    while (u < g.n) {
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) {
        if (u < g.nbr(e)) b += ((u, g.nbr(e), g.wgt(e)))
        e += 1
      }
      u += 1
    }
    b.result()
  }

  /** Small Erdős–Rényi graph with uniform(0,1] weights — generic fixture
    * for property tests. Guaranteed connected-ish via a spanning path.
    */
  def randomGraph(n: Int, p: Double, seed: Long): WeightedGraph = {
    val rnd = new Random(seed)
    val edges = Seq.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < n - 1) { edges += ((i, i + 1, rnd.nextDouble() + 0.05)); i += 1 }
    for (u <- 0 until n; v <- u + 2 until n)
      if (rnd.nextDouble() < p) edges += ((u, v, rnd.nextDouble() + 0.05))
    WeightedGraph.fromUndirectedEdges(n, edges.result())
  }
}
