package repro.core

import repro.graph.WeightedGraph

/** Per-edge termination thresholds θ(u,v) for EdgePush (§5.2).
  *
  * Thresholds are indexed by *directed* edge index (the CSR position), so
  * θ for ⟨u,v⟩ and ⟨v,u⟩ are distinct entries (and differ under the
  * normalized-additive-error rule, which depends on the destination).
  */
object Thresholds {

  /** Theorem 2: θ(u,v) = ε·√A_uv / Σ_{⟨x,y⟩∈Ē} √A_xy. Guarantees overall
    * ℓ1-error Σθ = ε and minimizes the expected cost (Cauchy–Schwarz).
    */
  def l1(g: WeightedGraph, eps: Double): Array[Double] = {
    require(eps > 0)
    val denom = g.sumSqrtWeights
    Array.tabulate(g.directedEdgeCount)(e => eps * math.sqrt(g.wgt(e)) / denom)
  }

  /** Theorem 3: θ(u,v) = r_max·d(v)·√A_uv / Σ_{x∈N(v)} √A_xv — note the
    * dependence on the *destination* v's neighborhood. Guarantees
    * normalized additive error ≤ r_max for every node.
    */
  def rmax(g: WeightedGraph, rmax: Double): Array[Double] = {
    require(rmax > 0)
    val theta = new Array[Double](g.directedEdgeCount)
    var e = 0
    while (e < theta.length) {
      val v = g.nbr(e)
      theta(e) = rmax * g.deg(v) * math.sqrt(g.wgt(e)) / g.sumSqrtWeightsPerNode(v)
      e += 1
    }
    theta
  }

  /** The global LocalPush threshold that yields ℓ1-error ε (Fact 1):
    * θ = ε / ‖A‖₁, applied as r(u) ≥ d(u)·θ.
    */
  def localPushL1Theta(g: WeightedGraph, eps: Double): Double = eps / g.totalWeight
}

/** Result of one SSPPR query.
  *
  * @param pi          estimated SSPPR vector π̂ (length n)
  * @param pushOps     granular push operations performed (node-level for
  *                    LocalPush, edge-level for EdgePush)
  * @param edgeTouches edges examined — the paper's cost unit: Σ n(u) over
  *                    node pushes for LocalPush; one per edge push plus one
  *                    per scanned edge for EdgePush; iterations·2m for the
  *                    Power Method
  * @param walkSteps   random-walk steps taken (Monte-Carlo phases)
  * @param wallNanos   wall-clock time of the query
  */
final case class PprResult(
    pi: Array[Double],
    pushOps: Long,
    edgeTouches: Long,
    walkSteps: Long,
    wallNanos: Long,
) {
  /** Unified hardware-independent work metric. */
  def totalWork: Long = edgeTouches + walkSteps

  def wallMillis: Double = wallNanos / 1e6
}
