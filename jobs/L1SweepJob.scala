package repro.jobs

import repro.graphgen.Datasets
import repro.harness.Harness

/** spark-submit entrypoint for the §6.2 ℓ1-error sweeps (Figures 10/13/14
  * as a table): EdgePush-ℓ1 (scan switching) vs PowForPush vs Power Method.
  *
  * Usage: spark-submit --class repro.jobs.L1SweepJob repro.jar \
  *          [scale] [dataset keys...]
  */
object L1SweepJob {

  def run(scale: Int, keys: Seq[String]): String = {
    val rows = keys.flatMap { key =>
      val g = Datasets.byKey(key).build(scale)
      val sources = g.sampleSourcesByDegree(5, seed = 7)
      Harness.l1Sweep(key, g, sources,
        epsValues = Seq(1e-1, 1e-2, 1e-3, 1e-4, 1e-5))
    }
    Harness.sweepTable(rows)
  }

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toInt).getOrElse(3000)
    val keys = if (args.length > 1) args.drop(1).toSeq else Seq("TA", "TH", "BC")
    println("== §6.2 sweep: l1 error vs cost ==")
    println(run(scale, keys))
  }
}
