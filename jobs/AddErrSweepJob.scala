package repro.jobs

import repro.graphgen.Datasets
import repro.harness.Harness

/** spark-submit entrypoint for the §6.1 normalized-additive-error sweeps
  * (the content of Figures 4/5/7/8 as a table): EdgePush-Add vs MAPPR vs
  * MC vs FORA vs SpeedPPR across r_max / δ.
  *
  * Usage: spark-submit --class repro.jobs.AddErrSweepJob repro.jar \
  *          [scale] [dataset keys...]
  */
object AddErrSweepJob {

  def run(scale: Int, keys: Seq[String]): String = {
    val rows = keys.flatMap { key =>
      val g = Datasets.byKey(key).build(scale)
      val sources = g.sampleSourcesByDegree(5, seed = 7)
      Harness.addErrSweep(key, g, sources,
        rmaxValues = Seq(1e-3, 1e-4, 1e-5, 1e-6, 1e-7),
        deltas = Seq(1e-1, 1e-2, 1e-3, 1e-4))
    }
    Harness.sweepTable(rows)
  }

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toInt).getOrElse(3000)
    val keys = if (args.length > 1) args.drop(1).toSeq else Seq("TA", "TH", "BC")
    println("== §6.1 sweep: normalized additive error vs cost ==")
    println(run(scale, keys))
  }
}
