package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Harness
import repro.jobs.Table1Job

/** Reproduces Table 1: LocalPush vs EdgePush expected cost and the
  * improvement factor, predicted ((1−α)cos²φ resp. (1−α)/2m·Σn_v·cos²φ_v)
  * vs measured (push-op counts), on graphs of increasing unbalancedness.
  *
  * Paper claim (Table 1): EdgePush/LocalPush cost ratio =
  * (1−α)·cos²φ for ℓ1 error; on the complete unbalanced graph the ratio is
  * O(1/n); on balanced graphs it is ≈ (1−α).
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: predicted vs measured EdgePush/LocalPush cost ratios") {
    val out = Table1Job.run(scale = 2000, eps = 1e-2, rmax = 1e-4, nSources = 5)
    println("\n== Table 1 (bench): LocalPush vs EdgePush ==")
    println(out)
    assert(out.nonEmpty)
  }

  test("Table 1 shape: measured ratio within an order of magnitude of predicted") {
    val rows = Table1Job.graphs(800).map { case (name, g) =>
      val sources = g.sampleSourcesByDegree(3, seed = 7)
      Harness.table1Row(name, g, sources, eps = 1e-2, rmax = 1e-4)
    }
    rows.foreach { r =>
      // The prediction bounds *expected* cost over degree-sampled sources;
      // require agreement within 20x both ways (shape, not absolutes).
      assert(r.measuredL1Ratio < math.max(20 * r.predictedL1Ratio, 2.0),
        s"${r.graph}: measured ${r.measuredL1Ratio} vs predicted ${r.predictedL1Ratio}")
    }
    // unbalanced graphs must show a clearly smaller ratio than balanced ones
    val byName = rows.map(r => r.graph -> r).toMap
    assert(byName("completeUnbalanced").measuredL1Ratio <
      byName("completeUniform").measuredL1Ratio)
  }
}
