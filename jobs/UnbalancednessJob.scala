package repro.jobs

import repro.core.{EdgePushSeq, LocalPushSeq, Thresholds}
import repro.graphgen.Affinity
import repro.harness.Harness
import repro.metrics.Unbalancedness

/** spark-submit entrypoint for §6.3 (Figures 16/17 as a table): sensitivity
  * of EdgePush's advantage to edge-weight unbalancedness on the four
  * Gaussian-kernel affinity graphs.
  *
  * Usage: spark-submit --class repro.jobs.UnbalancednessJob repro.jar [n]
  */
object UnbalancednessJob {

  // rmax is mild because ‖A‖₁ of the most unbalanced affinity graph is
  // tiny (kernel weights ≪ 1): LocalPush's 2m/(α·r_max·‖A‖₁) cost explodes
  // otherwise. The EdgePush/LocalPush *ratio* is what the table reports.
  def run(n: Int, eps: Double = 1e-2, rmax: Double = 1e-3,
          nSources: Int = 3): String = {
    val rows = Affinity.paperConfigs.zipWithIndex.map { case (cfg, i) =>
      val g = Affinity.graph(n, cfg, seed = 17 + i)
      val sources = g.sampleSourcesByDegree(nSources, seed = 7)
      val row = Harness.table1Row(s"affinity#${i + 1}(k=${cfg.kappa})", g,
        sources, eps, rmax)
      Seq(row.graph, g.n.toString, g.m.toString,
        Harness.fmtD(row.cos2Phi),
        Harness.fmtD(Unbalancedness.avgNodeCos2(g) * 2), // (Σ n_v cos²φ_v)/m
        Harness.fmtD(row.predictedL1Ratio), Harness.fmtD(row.measuredL1Ratio),
        Harness.fmtD(row.predictedRmaxRatio), Harness.fmtD(row.measuredRmaxRatio))
    }
    Harness.formatTable(
      Seq("graph", "n", "m", "cos2phi", "sum nv*cos2phi_v/m",
        "predL1", "measL1", "predRmax", "measRmax"),
      rows)
  }

  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(800)
    println("== §6.3: unbalancedness sensitivity on affinity graphs ==")
    println(run(n))
  }
}
