package repro.metrics

import repro.graph.WeightedGraph

/** Unbalancedness notions of §5: cos²φ, per-node cos²φ_v, the
  * (a,b)-unbalancedness factor γ, and the Table-1 theoretical costs.
  */
object Unbalancedness {

  /** Global cos²φ = (Σ_{⟨u,v⟩∈Ē} √A_uv)² / (2m · ‖A‖₁) — Lemma 6. The
    * smaller, the more unbalanced; ∈ (0, 1] by Cauchy–Schwarz.
    */
  def cos2Phi(g: WeightedGraph): Double = {
    val s = g.sumSqrtWeights
    s * s / (g.directedEdgeCount.toDouble * g.totalWeight)
  }

  /** Per-node cos²φ_v = (Σ_{x∈N(v)} √A_xv)² / (n(v) · d(v)) — Lemma 7. */
  def cos2PhiNode(g: WeightedGraph, v: Int): Double = {
    val nv = g.nbrCount(v)
    if (nv == 0) 1.0
    else {
      val s = g.sumSqrtWeightsPerNode(v)
      s * s / (nv.toDouble * g.deg(v))
    }
  }

  /** Σ_v n(v)·cos²φ_v / (2m) — the normalized-additive-error improvement
    * factor of Lemma 7 (without the (1−α) term).
    */
  def avgNodeCos2(g: WeightedGraph): Double = {
    var s = 0.0
    var v = 0
    while (v < g.n) { s += g.nbrCount(v) * cos2PhiNode(g, v); v += 1 }
    s / g.directedEdgeCount.toDouble
  }

  /** The (a,b)-unbalancedness factor γ = (√(ab) + √((1−a)(1−b)))² of
    * Lemmas 9/10; γ ∈ (0, 1].
    */
  def gamma(a: Double, b: Double): Double = {
    require(a >= 0 && a <= b && b <= 1, s"need 0 ≤ a ≤ b ≤ 1, got ($a,$b)")
    val r = math.sqrt(a * b) + math.sqrt((1 - a) * (1 - b))
    r * r
  }

  /** The tightest (a, b) for which node v is (a,b)-unbalanced with the
    * smallest fraction `a` of edges: sort v's weights descending and find,
    * for each prefix of size k, b(k) = prefix weight / d(v); return the
    * (k/n(v), b(k)) minimizing γ. Degree-0 and degree-1 nodes are (1,1).
    */
  def tightestAB(g: WeightedGraph, v: Int): (Double, Double) = {
    val nv = g.nbrCount(v)
    if (nv <= 1) return (1.0, 1.0)
    val ws = g.wgt.slice(g.indptr(v), g.indptr(v + 1)).sortBy(-_)
    var best = (1.0, 1.0)
    var bestGamma = 1.0
    var prefix = 0.0
    var k = 0
    while (k < nv) {
      prefix += ws(k)
      val a = (k + 1).toDouble / nv
      val b = math.min(1.0, prefix / g.deg(v))
      if (a <= b) {
        val gam = gamma(a, b)
        if (gam < bestGamma) { bestGamma = gam; best = (a, b) }
      }
      k += 1
    }
    best
  }

  /** Table-1 expected-cost formulas (degree-distributed source, Big-Oh
    * bodies without the constants the O() hides).
    */
  object TheoreticalCost {

    /** LocalPush, ℓ1-error ε: 2m / (α ε). */
    def localPushL1(g: WeightedGraph, alpha: Double, eps: Double): Double =
      g.directedEdgeCount / (alpha * eps)

    /** EdgePush, ℓ1-error ε: (1−α)(Σ√A)² / (α ε ‖A‖₁). */
    def edgePushL1(g: WeightedGraph, alpha: Double, eps: Double): Double = {
      val s = g.sumSqrtWeights
      (1 - alpha) * s * s / (alpha * eps * g.totalWeight)
    }

    /** LocalPush, normalized additive error r_max: 2m / (α r_max ‖A‖₁). */
    def localPushRmax(g: WeightedGraph, alpha: Double, rmax: Double): Double =
      g.directedEdgeCount / (alpha * rmax * g.totalWeight)

    /** EdgePush, normalized additive error r_max:
      * (1−α)/(α r_max ‖A‖₁) · Σ_v (Σ_{x∈N(v)} √A_xv)² / d(v).
      */
    def edgePushRmax(g: WeightedGraph, alpha: Double, rmax: Double): Double = {
      var s = 0.0
      var v = 0
      while (v < g.n) {
        if (g.deg(v) > 0) {
          val sq = g.sumSqrtWeightsPerNode(v)
          s += sq * sq / g.deg(v)
        }
        v += 1
      }
      (1 - alpha) * s / (alpha * rmax * g.totalWeight)
    }

    /** Predicted EdgePush/LocalPush cost ratio for ℓ1: (1−α)·cos²φ. */
    def improvementL1(g: WeightedGraph, alpha: Double): Double =
      (1 - alpha) * cos2Phi(g)

    /** Predicted ratio for r_max: (1−α)/2m · Σ_v n(v)·cos²φ_v. */
    def improvementRmax(g: WeightedGraph, alpha: Double): Double =
      (1 - alpha) * avgNodeCos2(g)
  }

  /** Mean undirected edge weight (Table 2 "mean" column). */
  def meanWeight(g: WeightedGraph): Double = g.totalWeight / g.directedEdgeCount

  /** Max edge weight (Table 2 "max" column). */
  def maxWeight(g: WeightedGraph): Double = if (g.wgt.isEmpty) 0.0 else g.wgt.max
}
