package repro.core

import repro.graph.WeightedGraph
import scala.util.Random

/** Monte-Carlo sampling (§3): simulate W α-random walks from s; π̂(u) is
  * the fraction of walks that stop at u. On weighted graphs each step
  * moves to neighbor v with probability A_uv/d(u) (sampled via per-node
  * prefix sums + binary search).
  *
  * The walk count follows the standard (δ, ε_r, p_f) Chernoff setting used
  * by FORA/SpeedPPR: W = (2ε_r/3 + 2)·ln(2/p_f) / (ε_r²·δ).
  */
object MonteCarloSeq {

  /** Walk count for relative error ε_r at threshold δ w.p. 1−p_f. */
  def walkCount(delta: Double, epsR: Double, pf: Double): Long =
    math.ceil((2 * epsR / 3 + 2) * math.log(2.0 / pf) / (epsR * epsR * delta)).toLong

  /** Per-node cumulative weight index for O(log d) neighbor sampling. */
  final class AliasIndex(g: WeightedGraph) {
    val cum: Array[Double] = {
      val c = new Array[Double](g.directedEdgeCount)
      var u = 0
      while (u < g.n) {
        var acc = 0.0
        var e = g.indptr(u)
        while (e < g.indptr(u + 1)) { acc += g.wgt(e); c(e) = acc; e += 1 }
        u += 1
      }
      c
    }

    /** Sample a neighbor of u proportional to edge weight. */
    def sample(g: WeightedGraph, u: Int, rnd: Random): Int = {
      val lo = g.indptr(u); val hi = g.indptr(u + 1)
      val x = rnd.nextDouble() * g.deg(u)
      var a = lo; var b = hi - 1
      while (a < b) {
        val mid = (a + b) >>> 1
        if (cum(mid) < x) a = mid + 1 else b = mid
      }
      g.nbr(a)
    }
  }

  def compute(g: WeightedGraph, s: Int, alpha: Double, walks: Long,
              seed: Long = 42): PprResult = {
    val t0 = System.nanoTime()
    val idx = new AliasIndex(g)
    val rnd = new Random(seed)
    val stops = new Array[Double](g.n)
    var steps = 0L
    var w = 0L
    while (w < walks) {
      var u = s
      var alive = true
      while (alive) {
        if (rnd.nextDouble() < alpha || g.deg(u) <= 0) alive = false
        else { u = idx.sample(g, u, rnd); steps += 1 }
      }
      stops(u) += 1.0
      w += 1
    }
    val pi = stops.map(_ / walks)
    PprResult(pi, pushOps = 0, edgeTouches = 0, walkSteps = steps,
      wallNanos = System.nanoTime() - t0)
  }
}
