package repro.jobs

import repro.graph.WeightedGraph
import repro.graphgen.{Affinity, GraphGen}
import repro.harness.Harness
import repro.motif.MotifWeights

/** spark-submit entrypoint reproducing Table 1: predicted vs measured
  * EdgePush/LocalPush cost ratios for both error regimes on graphs of
  * increasing unbalancedness.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job repro.jar [scale]
  */
object Table1Job {
  def graphs(scale: Int): Seq[(String, WeightedGraph)] = Seq(
    "star(Fig1)" -> GraphGen.unbalancedStar(scale),
    "completeUnbalanced" -> GraphGen.unbalancedComplete(math.min(scale, 400)),
    "completeUniform" -> GraphGen.uniformComplete(math.min(scale, 400)),
    "powerlaw+motif" -> MotifWeights.motifWeightedGraph(
      GraphGen.chungLu(scale * 4, avgDeg = 12, beta = 2.3, seed = 7)),
    "powerlaw+pareto" -> GraphGen.withParetoWeights(
      GraphGen.chungLu(scale * 4, avgDeg = 12, beta = 2.3, seed = 7), alpha = 0.8),
    "affinity(k=1)" -> Affinity.graph(math.min(scale, 500), Affinity.paperConfigs(0)),
    "affinity(k=20)" -> Affinity.graph(math.min(scale, 500), Affinity.paperConfigs(3)),
  )

  def run(scale: Int, eps: Double, rmax: Double, nSources: Int): String = {
    val rows = graphs(scale).map { case (name, g) =>
      val sources = g.sampleSourcesByDegree(nSources, seed = 7)
      Harness.table1Row(name, g, sources, eps, rmax)
    }
    Harness.formatTable(
      Seq("graph", "n", "m", "cos2phi", "predL1", "measL1", "predRmax",
        "measRmax", "LP-work(l1)", "EP-work(l1)", "LP-work(rmax)", "EP-work(rmax)"),
      rows.map(r => Seq(r.graph, r.n.toString, r.m.toString,
        Harness.fmtD(r.cos2Phi), Harness.fmtD(r.predictedL1Ratio),
        Harness.fmtD(r.measuredL1Ratio), Harness.fmtD(r.predictedRmaxRatio),
        Harness.fmtD(r.measuredRmaxRatio), Harness.fmtD(r.localPushWorkL1),
        Harness.fmtD(r.edgePushWorkL1), Harness.fmtD(r.localPushWorkRmax),
        Harness.fmtD(r.edgePushWorkRmax))))
  }

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toInt).getOrElse(1000)
    println("== Table 1: LocalPush vs EdgePush cost (predicted vs measured) ==")
    // ε/r_max sized so LocalPush's 2m/(αε) cost stays ≤ ~1e8 per query on
    // the small-‖A‖₁ synthetic graphs.
    println(run(scale, eps = 1e-2, rmax = 1e-4, nSources = 5))
  }
}
