package repro.core

import repro.graph.WeightedGraph
import scala.util.Random

/** SpeedPPR (§3, Wu et al.): PowForPush for the push phase + the same
  * Monte-Carlo residue compensation as FORA. The scan-switching push makes
  * the deterministic phase cheaper at small thresholds, which is where
  * SpeedPPR overtakes FORA.
  */
object SpeedPprSeq {

  def compute(g: WeightedGraph, s: Int, alpha: Double, delta: Double,
              epsR: Double = 0.5, pf: Double = 1e-6, seed: Long = 42,
              scanSwitchFrac: Double = 0.125): PprResult = {
    val t0 = System.nanoTime()
    val omega = MonteCarloSeq.walkCount(delta, epsR, pf).toDouble
    val theta = math.sqrt(g.directedEdgeCount.toDouble / (alpha * omega)) / g.totalWeight

    // PowForPush phase. We need residues afterwards: recompute them from
    // the invariant is impossible without r, so inline a residue-retaining
    // run of the same switching logic.
    val r = new Array[Double](g.n)
    val pi = new Array[Double](g.n)
    val inQ = new Array[Boolean](g.n)
    val queue = new java.util.ArrayDeque[Integer]()
    r(s) = 1.0
    var pushOps = 0L
    var touches = 0L
    val switchAt = math.max(1.0, scanSwitchFrac * g.n)
    var switched = false

    def eligible(u: Int): Boolean = g.deg(u) > 0 && r(u) >= g.deg(u) * theta

    def pushNode(u: Int, enqueue: Boolean): Unit = {
      val ru = r(u)
      pi(u) += alpha * ru
      r(u) = 0.0
      val scale = (1 - alpha) * ru / g.deg(u)
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) {
        val v = g.nbr(e)
        r(v) += scale * g.wgt(e)
        touches += 1
        if (enqueue && !inQ(v) && eligible(v)) { queue.add(v); inQ(v) = true }
        e += 1
      }
      pushOps += 1
    }

    if (eligible(s)) { queue.add(s); inQ(s) = true }
    while (!queue.isEmpty && !switched) {
      val u: Int = queue.poll()
      inQ(u) = false
      if (eligible(u)) pushNode(u, enqueue = true)
      if (queue.size() > switchAt) switched = true
    }
    if (switched) {
      var anyPush = true
      while (anyPush) {
        anyPush = false
        var u = 0
        while (u < g.n) {
          touches += 1
          if (eligible(u)) { pushNode(u, enqueue = false); anyPush = true }
          u += 1
        }
      }
    }

    // Monte-Carlo compensation of the remaining residues (as in FORA).
    val idx = new MonteCarloSeq.AliasIndex(g)
    val rnd = new Random(seed)
    var steps = 0L
    var u = 0
    while (u < g.n) {
      val ru = r(u)
      if (ru > 0) {
        val wU = math.max(1L, math.ceil(ru * omega).toLong)
        val inc = ru / wU
        var w = 0L
        while (w < wU) {
          var x = u
          var alive = true
          while (alive) {
            if (rnd.nextDouble() < alpha || g.deg(x) <= 0) alive = false
            else { x = idx.sample(g, x, rnd); steps += 1 }
          }
          pi(x) += inc
          w += 1
        }
      }
      u += 1
    }
    PprResult(pi, pushOps, touches, steps, wallNanos = System.nanoTime() - t0)
  }
}
