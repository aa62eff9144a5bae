package repro.graphgen

import repro.graph.WeightedGraph
import scala.util.Random

/** §6.3 affinity graphs: fully connected Gaussian-kernel graphs over
  * synthetic points.
  *
  * Each of `n` nodes is a point x_i ∈ R^κ with coordinates drawn i.i.d.
  * from N(0, σ_N²). The weight of edge (x_i, x_j) is
  * A_ij = exp(−‖x_i − x_j‖² / 2σ²) with σ² = c · κ² · σ_N² (the paper's
  * "σ² = c·d²·σ_N²" with d the data dimension). Small κ with large σ_N²
  * makes pairwise distances highly variable ⇒ severely skewed weights
  * (small cos²φ); large κ concentrates distances ⇒ balanced weights.
  */
object Affinity {

  /** The paper's four §6.3 configurations, in order of decreasing
    * unbalancedness: κ = (1, 1, 13, 20), σ_N² = (10³, 50, 50, 50),
    * c = (0.1, 1, 1, 1).
    */
  final case class Config(kappa: Int, sigmaN2: Double, c: Double)

  val paperConfigs: Seq[Config] = Seq(
    Config(1, 1000.0, 0.1),
    Config(1, 50.0, 1.0),
    Config(13, 50.0, 1.0),
    Config(20, 50.0, 1.0),
  )

  /** Sample the point cloud: n × κ Gaussian coordinates. */
  def samplePoints(n: Int, cfg: Config, seed: Long): Array[Array[Double]] = {
    val rnd = new Random(seed)
    val sd = math.sqrt(cfg.sigmaN2)
    Array.fill(n)(Array.fill(cfg.kappa)(rnd.nextGaussian() * sd))
  }

  /** Build the fully connected affinity graph over a sampled point cloud.
    * O(n²κ) — intended for n up to a few thousand (the paper uses 10⁵ on a
    * 500 GB machine; see DESIGN.md substitutions).
    */
  def graph(n: Int, cfg: Config, seed: Long = 17): WeightedGraph = {
    val pts = samplePoints(n, cfg, seed)
    val sigma2 = cfg.c * cfg.kappa.toDouble * cfg.kappa.toDouble * cfg.sigmaN2
    val edges = Seq.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        var d2 = 0.0
        var k = 0
        while (k < cfg.kappa) {
          val diff = pts(i)(k) - pts(j)(k)
          d2 += diff * diff
          k += 1
        }
        val w = math.exp(-d2 / (2.0 * sigma2))
        // exp can underflow to 0 for extremely distant points; such pairs
        // are effectively non-edges (A_ij = 0 ⇒ ⟨i,j⟩ ∉ Ē).
        if (w > 0) edges += ((i, j, w))
        j += 1
      }
      i += 1
    }
    WeightedGraph.fromUndirectedEdges(n, edges.result())
  }
}
