package repro.jobs

import repro.graphgen.Datasets
import repro.harness.Harness
import repro.metrics.Unbalancedness

/** spark-submit entrypoint reproducing Table 2: dataset statistics
  * (n, m, mean/max edge weight, cos²φ) for the eight synthetic stand-ins,
  * printed next to the paper's values for the real datasets.
  *
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar [scale]
  */
object Table2Job {

  def run(scale: Int): String = {
    val rows = Datasets.all.map { spec =>
      val g = spec.build(scale)
      val nonIsolated = (0 until g.n).count(g.deg(_) > 0)
      Seq(spec.key, nonIsolated.toString, g.m.toString,
        Harness.fmtD(Unbalancedness.meanWeight(g)),
        Harness.fmtD(Unbalancedness.maxWeight(g)),
        Harness.fmtD(Unbalancedness.cos2Phi(g)),
        spec.paperN.toString, spec.paperM.toString,
        Harness.fmtD(spec.paperMeanW), Harness.fmtD(spec.paperMaxW),
        Harness.fmtD(spec.paperCos2))
    }
    Harness.formatTable(
      Seq("dataset", "n", "m", "meanW", "maxW", "cos2phi",
        "paper-n", "paper-m", "paper-meanW", "paper-maxW", "paper-cos2phi"),
      rows)
  }

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toInt).getOrElse(5000)
    println("== Table 2: dataset statistics (stand-ins vs paper) ==")
    println(run(scale))
  }
}
