package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.Datasets
import repro.jobs.Table2Job
import repro.metrics.Unbalancedness

/** Reproduces Table 2: dataset statistics (n, m, mean/max weight, cos²φ)
  * for the eight synthetic stand-ins, printed alongside the paper's values.
  * The quantity that must match in *shape* is cos²φ — the theory's driver.
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: dataset statistics, stand-ins vs paper") {
    val out = Table2Job.run(scale = 5000)
    println("\n== Table 2 (bench): dataset statistics ==")
    println(out)
    assert(out.nonEmpty)
  }

  test("Table 2 shape: cos2phi ordering mirrors the paper") {
    val cos = Datasets.all.map(s => s.key -> Unbalancedness.cos2Phi(s.build(3000))).toMap
    // Paper: TH (0.97) most balanced; TA (0.27) / SP (0.29) most unbalanced.
    assert(cos("TH") > 0.9, s"TH=${cos("TH")}")
    assert(cos("TA") < cos("TH") && cos("SP") < cos("TH"))
    assert(cos("TA") < 0.6 && cos("SP") < 0.6, s"TA=${cos("TA")} SP=${cos("SP")}")
  }
}
