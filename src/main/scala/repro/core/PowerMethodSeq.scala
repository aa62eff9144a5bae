package repro.core

import repro.graph.WeightedGraph

/** Power Method (§3): π^{ℓ+1} = (1−α)·P·π^ℓ + α·e_s with P = A·D⁻¹.
  * Each iteration touches every edge (Θ(m) per iteration); with L
  * iterations the error decays as (1−α)^L. The paper uses 100 iterations
  * of this method as ground truth; so do we.
  */
object PowerMethodSeq {

  def compute(g: WeightedGraph, s: Int, alpha: Double, iters: Int): PprResult = {
    val t0 = System.nanoTime()
    var pi = new Array[Double](g.n)
    pi(s) = 1.0 // π^(0) = e_s; the fixed point is independent of the start
    var next = new Array[Double](g.n)
    var it = 0
    while (it < iters) {
      java.util.Arrays.fill(next, 0.0)
      var u = 0
      while (u < g.n) {
        val pu = pi(u)
        if (pu != 0.0 && g.deg(u) > 0) {
          val scale = (1 - alpha) * pu / g.deg(u)
          var e = g.indptr(u)
          while (e < g.indptr(u + 1)) {
            next(g.nbr(e)) += scale * g.wgt(e)
            e += 1
          }
        } else if (pu != 0.0) {
          // Dangling (isolated) node: mass has nowhere to go; in the
          // α-walk view the walk is stuck and must stop here.
          next(u) += (1 - alpha) * pu
        }
        u += 1
      }
      next(s) += alpha
      val tmp = pi; pi = next; next = tmp
      it += 1
    }
    // π^(L) as computed above still contains a (1−α)^L "alive" component;
    // fold the per-node convention: the estimate is α-stopped mass plus the
    // final alive mass, i.e. the iterate itself (standard Power Method
    // estimate). Error ≤ (1−α)^L in ℓ1.
    val touches = iters.toLong * g.directedEdgeCount
    PprResult(pi, pushOps = 0, edgeTouches = touches, walkSteps = 0,
      wallNanos = System.nanoTime() - t0)
  }

  /** Ground-truth vector: 100 iterations, as in §6 ("Ground truths"). */
  def groundTruth(g: WeightedGraph, s: Int, alpha: Double): Array[Double] =
    compute(g, s, alpha, 100).pi
}
