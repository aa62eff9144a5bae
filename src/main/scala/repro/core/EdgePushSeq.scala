package repro.core

import repro.graph.WeightedGraph

/** EdgePush (Algorithm 2) with the §4.3 two-level candidate structure.
  *
  * State per the paper: node income q, edge expense Q; the edge residue
  * R_uv = (1−α)·q(u)·A_uv/d(u) − Q_uv is kept implicit. The candidate set
  * C = { ⟨u,v⟩ | R_uv ≥ θ(u,v) } is maintained via
  *
  *  - local level: a per-node min-heap Q(u) over u's out-edges keyed by
  *    k_u(v) = (Q_uv + θ(u,v)) / A_uv (keys only ever increase);
  *  - global level: a list L of nodes whose key
  *    K_u = −(1−α)q(u)/d(u) + Q(u).top is ≤ 0 (Observation 1: K_u ≤ 0 iff
  *    u's best edge is in C).
  *
  * The paper gets O(1) amortized per edge push with Thorup's word-RAM
  * priority queue (Fact 3); we use array-embedded binary heaps — O(log d)
  * per increase-key — which changes constants only, never the *number* of
  * edge pushes that Lemma 3 bounds.
  *
  * An optional scan mode mirrors the §6.2 PowForPush-style switch: once
  * the number of edge pushes exceeds `scanSwitchFrac·2m` (i.e. we have
  * already done more pushes than one full scan would cost), the two-level
  * structure is abandoned for sequential passes, pushing every edge whose
  * residue exceeds its threshold. A per-node pruning bound
  * max_e A_e/θ_e lets a pass skip nodes with no eligible edge in O(1),
  * so a scan pass costs n + Σ n(u) over flagged nodes, like PowForPush's.
  * Scanned nodes/edges are billed to `edgeTouches` so the cost comparison
  * stays honest.
  */
object EdgePushSeq {

  /** Run EdgePush with per-directed-edge thresholds `theta` (use
    * [[Thresholds.l1]] or [[Thresholds.rmax]]).
    *
    * @param scanSwitchFrac switch to sequential scans once edge pushes
    *                       exceed this multiple of 2m; `None` disables
    *                       switching (pure two-level structure, as in
    *                       Algorithm 2)
    */
  def compute(g: WeightedGraph, s: Int, alpha: Double, theta: Array[Double],
              scanSwitchFrac: Option[Double] = None): PprResult =
    run(g, s, alpha, theta, scanSwitchFrac)._1

  /** Full run exposing the terminal state (result, q, edge expense Q). */
  def run(g: WeightedGraph, s: Int, alpha: Double, theta: Array[Double],
          scanSwitchFrac: Option[Double] = None): (PprResult, Array[Double], Array[Double]) = {
    require(theta.length == g.directedEdgeCount)
    val t0 = System.nanoTime()
    val n = g.n
    val q = new Array[Double](n)
    val expense = new Array[Double](g.directedEdgeCount) // Q_uv
    q(s) = 1.0

    var pushOps = 0L
    var touches = 0L

    // --- local level: per-node binary heaps embedded in the CSR layout ---
    // key(e) = (Q_e + θ_e) / w_e; heap(p) holds an edge index; hpos(e) is
    // the absolute heap position of edge e within its node's segment.
    val key = new Array[Double](g.directedEdgeCount)
    val heap = new Array[Int](g.directedEdgeCount)
    val hpos = new Array[Int](g.directedEdgeCount)
    var e = 0
    while (e < key.length) {
      key(e) = theta(e) / g.wgt(e)
      heap(e) = e
      hpos(e) = e
      e += 1
    }

    def swap(p1: Int, p2: Int): Unit = {
      val e1 = heap(p1); val e2 = heap(p2)
      heap(p1) = e2; heap(p2) = e1
      hpos(e1) = p2; hpos(e2) = p1
    }

    /** Restore the heap property downward from absolute position `p`
      * inside node u's segment [lo, hi).
      */
    def siftDown(lo: Int, hi: Int, p0: Int): Unit = {
      var p = p0
      var continue = true
      while (continue) {
        val left = lo + 2 * (p - lo) + 1
        val right = left + 1
        var smallest = p
        if (left < hi && key(heap(left)) < key(heap(smallest))) smallest = left
        if (right < hi && key(heap(right)) < key(heap(smallest))) smallest = right
        if (smallest == p) continue = false
        else { swap(p, smallest); p = smallest }
      }
    }

    // Heapify every node's segment (keys start at θ/w — already set).
    var u = 0
    while (u < n) {
      val lo = g.indptr(u); val hi = g.indptr(u + 1)
      var p = lo + (hi - lo) / 2 - 1
      while (p >= lo) { siftDown(lo, hi, p); p -= 1 }
      u += 1
    }

    // K_u ≤ 0  ⇔  (1−α)q(u)/d(u) ≥ key(top of Q(u))
    def eligible(x: Int): Boolean = {
      val lo = g.indptr(x)
      lo < g.indptr(x + 1) && g.deg(x) > 0 &&
        (1 - alpha) * q(x) / g.deg(x) >= key(heap(lo))
    }

    // --- global level: list L of nodes with K_u ≤ 0 (lazily validated) ---
    val inL = new Array[Boolean](n)
    val list = new java.util.ArrayDeque[Integer]()
    var inLCount = 0
    def addL(x: Int): Unit =
      if (!inL(x)) { inL(x) = true; inLCount += 1; list.add(x) }

    if (eligible(s)) addL(s)

    val switchAt = scanSwitchFrac.map(f => f * g.directedEdgeCount)
    var switched = false

    while (!list.isEmpty && !switched) {
      val x: Int = list.poll()
      inL(x) = false
      inLCount -= 1
      // Drain x: pushing along x's best edge only raises that edge's key,
      // so repeated find-min pushes stay correct until K_x > 0.
      var go = eligible(x)
      while (go) {
        val lo = g.indptr(x)
        val eTop = heap(lo)
        val v = g.nbr(eTop)
        val y = (1 - alpha) * q(x) * g.wgt(eTop) / g.deg(x) - expense(eTop)
        // y ≥ θ(eTop) by eligibility; guard against FP fuzz anyway.
        if (y > 0) {
          expense(eTop) += y
          q(v) += y
          pushOps += 1
          touches += 1
        }
        // increase-key of eTop, then re-check the two affected nodes.
        key(eTop) = (expense(eTop) + theta(eTop)) / g.wgt(eTop)
        siftDown(lo, g.indptr(x + 1), lo)
        if (eligible(v)) addL(v)
        go = eligible(x)
      }
      if (switchAt.exists(pushOps > _)) switched = true
    }

    if (switched) {
      // §6.2-style sequential scan phase: passes over Ē pushing every edge
      // with R_e ≥ θ_e, until a pass performs no push. A node u can have an
      // eligible edge only if (1−α)·q(u)/d(u) · max_e(A_e/θ_e) ≥ 1 (the
      // bound ignores Q_e ≥ 0, so it is conservative); nodes failing it
      // are skipped in O(1), keeping pass cost ≈ n + Σ_{flagged} n(u).
      val maxWT = new Array[Double](n)
      var x0 = 0
      while (x0 < n) {
        var p = g.indptr(x0)
        while (p < g.indptr(x0 + 1)) {
          val r = g.wgt(p) / theta(p)
          if (r > maxWT(x0)) maxWT(x0) = r
          p += 1
        }
        x0 += 1
      }
      // Exact skip: R_e = (1−α)q(u)A_e/d(u) − Q_e changes only when q(u)
      // grows (Q_e changes only during u's own scan), so a node scanned
      // clean needs rescanning only once its income changed.
      val lastScanQ = Array.fill(n)(-1.0)
      var anyPush = true
      while (anyPush) {
        anyPush = false
        var x = 0
        while (x < n) {
          touches += 1 // the O(1) per-node prune check
          if (g.deg(x) > 0 && q(x) > 0 && q(x) != lastScanQ(x) &&
              (1 - alpha) * q(x) / g.deg(x) * maxWT(x) >= 1.0) {
            val scale = (1 - alpha) * q(x) / g.deg(x)
            lastScanQ(x) = q(x)
            var p = g.indptr(x)
            while (p < g.indptr(x + 1)) {
              touches += 1
              val y = scale * g.wgt(p) - expense(p)
              if (y >= theta(p)) {
                expense(p) += y
                q(g.nbr(p)) += y
                pushOps += 1
                anyPush = true
              }
              p += 1
            }
          }
          x += 1
        }
      }
    }

    val pi = new Array[Double](n)
    var i = 0
    while (i < n) { pi(i) = alpha * q(i); i += 1 }
    (PprResult(pi, pushOps, touches, walkSteps = 0, wallNanos = System.nanoTime() - t0),
      q, expense)
  }

  /** Variant returning (π̂, R) where R is the final edge-residue array
    * R_e = (1−α)·q(u)·A_e/d(u) − Q_e — used by invariant tests.
    */
  def computeWithResidues(g: WeightedGraph, s: Int, alpha: Double,
                          theta: Array[Double]): (Array[Double], Array[Double]) = {
    val (result, q, expense) = run(g, s, alpha, theta)
    val residues = new Array[Double](g.directedEdgeCount)
    var u = 0
    while (u < g.n) {
      if (g.deg(u) > 0) {
        val scale = (1 - alpha) * q(u) / g.deg(u)
        var e = g.indptr(u)
        while (e < g.indptr(u + 1)) {
          residues(e) = scale * g.wgt(e) - expense(e)
          e += 1
        }
      }
      u += 1
    }
    (result.pi, residues)
  }
}
