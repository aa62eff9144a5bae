package repro.metrics

import repro.graph.WeightedGraph

/** Conductance and the sweep-cut procedure of §2 (local clustering).
  *
  * Φ(S) = cut(S) / min(vol(S), vol(V∖S)), where vol sums weighted degrees
  * and cut sums the weights of edges crossing the boundary. The sweep
  * ranks nodes by π̂(u)/d(u) and returns the minimum conductance over all
  * prefixes.
  */
object Conductance {

  /** Conductance of an explicit node set. Returns 1.0 for the degenerate
    * cases (empty set or full volume on one side).
    */
  def ofSet(g: WeightedGraph, set: Set[Int]): Double = {
    if (set.isEmpty) return 1.0
    var vol = 0.0
    var cut = 0.0
    set.foreach { u =>
      vol += g.deg(u)
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) {
        if (!set.contains(g.nbr(e))) cut += g.wgt(e)
        e += 1
      }
    }
    val other = g.totalWeight - vol
    val denom = math.min(vol, other)
    // cut ≥ 0 mathematically; clamp away FP cancellation on graphs whose
    // weights span many orders of magnitude.
    if (denom <= 0) 1.0 else math.max(cut, 0.0) / denom
  }

  /** Sweep over the ranking π̂(u)/d(u) (descending, nodes with π̂(u) > 0 and
    * d(u) > 0 only): returns (minimum conductance, prefix size achieving
    * it). Incremental O(vol(S)) computation: adding u changes
    * cut by d(u) − 2·w(u→S).
    */
  def sweep(g: WeightedGraph, pi: Array[Double]): (Double, Int) = {
    val order = (0 until g.n)
      .filter(u => pi(u) > 0 && g.deg(u) > 0)
      .sortBy(u => (-pi(u) / g.deg(u), u))
    if (order.isEmpty) return (1.0, 0)
    val inS = new Array[Boolean](g.n)
    var vol = 0.0
    var cut = 0.0
    var best = Double.MaxValue
    var bestK = 0
    var k = 0
    while (k < order.length) {
      val u = order(k)
      var wIn = 0.0
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) {
        if (inS(g.nbr(e))) wIn += g.wgt(e)
        e += 1
      }
      inS(u) = true
      vol += g.deg(u)
      cut += g.deg(u) - 2.0 * wIn
      val denom = math.min(vol, g.totalWeight - vol)
      if (denom > 0) {
        val phi = math.max(cut, 0.0) / denom // clamp FP cancellation
        if (phi < best) { best = phi; bestK = k + 1 }
      }
      k += 1
    }
    if (best == Double.MaxValue) (1.0, 0) else (best, bestK)
  }
}
