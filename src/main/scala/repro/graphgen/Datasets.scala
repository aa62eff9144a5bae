package repro.graphgen

import repro.graph.WeightedGraph
import repro.motif.MotifWeights

/** Synthetic stand-ins for the paper's eight real-world datasets (Table 2).
  *
  * The paper's graphs range up to 3.8 billion edges; we regenerate each
  * dataset's *character* — degree skew, weight law, and in particular the
  * unbalancedness cos²φ the theory keys on — at laptop scale (see
  * DESIGN.md §3). The first four are unweighted power-law graphs converted
  * to clique3 motif weights exactly as in MAPPR; the last four carry
  * heavy-tailed (Pareto) or near-uniform weights tuned to land in the same
  * cos²φ regime as the real data.
  *
  * Paper's Table 2 values (n, m, mean w, max w, cos²φ):
  *   YT 1.1M / 2.8M   / 6.6  / 4,034    / 0.65
  *   LJ 4.8M / 71M    / 24   / 4,445    / 0.51
  *   IC 7.4M / 295M   / 1221 / 178,448  / 0.31
  *   OL 3.1M / 202M   / 18   / 9,145    / 0.69
  *   TA 50K  / 8.3M   / 13   / 469,258  / 0.27
  *   TH 2.3M / 42M    / 1.1  / 546      / 0.97
  *   BC 596K / 1.8M   / 5.2  / 17,165   / 0.5
  *   SP 3.6M / 3.9B   / 8.6  / 2.9M     / 0.29
  */
object Datasets {

  final case class Spec(
      key: String,
      paperN: Long,
      paperM: Long,
      paperMeanW: Double,
      paperMaxW: Double,
      paperCos2: Double,
      build: Int => WeightedGraph, // scale (node count) => graph
  )

  private def motif(n: Int, avgDeg: Double, beta: Double, seed: Long): WeightedGraph =
    MotifWeights.motifWeightedGraph(GraphGen.chungLu(n, avgDeg, beta, seed))

  /** The eight stand-ins. `scale` is the node count of the base generator
    * (the motif graphs keep the id space but drop triangle-free edges).
    */
  val all: Seq[Spec] = Seq(
    // Motif-based weighted graphs (unweighted originals + clique3 counts).
    Spec("YT", 1138499L, 2795228L, 6.6, 4034, 0.65,
      n => motif(n, avgDeg = 8, beta = 2.2, seed = 101)),
    Spec("LJ", 4847571L, 71062058L, 24, 4445, 0.51,
      n => motif(n, avgDeg = 16, beta = 2.4, seed = 102)),
    // IC (IndoChina) is a web graph whose clique3 weights span 1..178448
    // because real web cliques vary in size by orders of magnitude; at
    // n ~ 10³ that variance is unreachable, so the stand-in lands at
    // cos²φ ≈ 0.7 instead of the paper's 0.31 (recorded in EXPERIMENTS.md).
    Spec("IC", 7414768L, 295191370L, 1221, 178448, 0.31,
      n => motif(n, avgDeg = 30, beta = 2.0, seed = 103)),
    Spec("OL", 3072441L, 202392682L, 18, 9145, 0.69,
      n => motif(n, avgDeg = 24, beta = 2.6, seed = 104)),
    // Real weighted graphs: heavy-tailed or near-uniform edge weights.
    // Pareto tail indices chosen to land near the paper's mean weights and
    // cos²φ values (α ≈ 1.05 ⇒ mean ~13-20, cos²φ ~0.2-0.3 like TA/SP;
    // α = 1.25 ⇒ mean ~5, cos²φ ~0.5 like BC). α ≤ 1 has infinite mean and
    // makes ‖A‖₁ blow up, trivializing every threshold — avoid.
    Spec("TA", 49945L, 8294604L, 13, 469258, 0.27,
      n => GraphGen.withParetoWeights(
        GraphGen.chungLu(n, avgDeg = 40, beta = 2.0, seed = 105), alpha = 1.05, seed = 205)),
    Spec("TH", 2321767L, 42012344L, 1.1, 546, 0.97,
      n => GraphGen.withUniformWeights(
        GraphGen.chungLu(n, avgDeg = 12, beta = 2.5, seed = 106), jitter = 0.2, seed = 206)),
    Spec("BC", 595753L, 1773544L, 5.2, 17165, 0.5,
      n => GraphGen.withParetoWeights(
        GraphGen.chungLu(n, avgDeg = 6, beta = 2.3, seed = 107), alpha = 1.25, seed = 207)),
    Spec("SP", 3604308L, 3854964026L, 8.6, 2878970, 0.29,
      n => GraphGen.withParetoWeights(
        GraphGen.chungLu(n, avgDeg = 50, beta = 2.1, seed = 108), alpha = 1.1, seed = 208)),
  )

  def byKey(key: String): Spec = all.find(_.key == key).getOrElse(
    throw new NoSuchElementException(s"unknown dataset $key"))
}
