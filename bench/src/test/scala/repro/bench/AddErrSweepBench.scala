package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.Datasets
import repro.harness.Harness

/** Reproduces the §6.1 content of Figures 4/5/7/8 as tables: trade-offs
  * between query cost and normalized MaxAddErr / normalized precision@50
  * for EdgePush-Add vs MAPPR vs MC vs FORA vs SpeedPPR.
  *
  * Paper claim: under equal normalized MaxAddErr, EdgePush costs the least
  * on every dataset, with the gap growing as cos²φ shrinks.
  */
class AddErrSweepBench extends AnyFunSuite {

  private val scale = 2500
  // On weighted graphs the normalized values π(u)/d(u) average 1/‖A‖₁, so
  // the interesting r_max range scales with the total weight — sweep to
  // 1e-8 (the paper sweeps to 1e-9 on graphs of comparable ‖A‖₁·n).
  private val rmaxValues = Seq(1e-4, 1e-5, 1e-6, 1e-7, 1e-8)
  private val deltas = Seq(1e-1, 1e-2, 1e-3)

  private def sweep(key: String) = {
    val g = Datasets.byKey(key).build(scale)
    val sources = g.sampleSourcesByDegree(5, seed = 7)
    Harness.addErrSweep(key, g, sources, rmaxValues, deltas)
  }

  // All eight stand-ins, as in Figures 4/5 (motif) and 7/8 (real weighted).
  private lazy val rows =
    Seq("YT", "LJ", "IC", "OL", "TA", "TH", "BC", "SP").flatMap(sweep)

  test("§6.1 sweep table (Figures 4/5/7/8)") {
    println("\n== §6.1: normalized additive error sweeps ==")
    println(Harness.sweepTable(rows))
    assert(rows.nonEmpty)
  }

  test("shape: EdgePush-Add is cheapest at matched rmax on unbalanced datasets") {
    Seq("TA", "BC").foreach { key =>
      val ds = rows.filter(_.dataset == key)
      rmaxValues.foreach { rm =>
        val ep = ds.find(r => r.method == "EdgePush-Add" && r.param == rm).get
        val lp = ds.find(r => r.method == "MAPPR" && r.param == rm).get
        // compare only where LocalPush does non-trivial work — at very
        // coarse r_max both methods do O(1) pushes and the counts are noise
        if (lp.work > 1000)
          assert(ep.work <= lp.work,
            s"$key rmax=$rm: EdgePush work ${ep.work} > MAPPR work ${lp.work}")
      }
    }
  }

  test("shape: the EdgePush advantage shrinks on the balanced TH dataset") {
    def ratioAt(key: String): Double = {
      val ds = rows.filter(r => r.dataset == key && r.param == 1e-7)
      val ep = ds.find(_.method == "EdgePush-Add").get
      val lp = ds.find(_.method == "MAPPR").get
      ep.work / math.max(lp.work, 1.0)
    }
    assert(ratioAt("TA") < ratioAt("TH"),
      s"TA ratio ${ratioAt("TA")} should beat TH ratio ${ratioAt("TH")}")
  }

  test("shape: precision@50 improves monotonically-ish with work for EdgePush") {
    val ep = rows.filter(r => r.dataset == "TA" && r.method == "EdgePush-Add")
      .sortBy(_.param).reverse // rmax large → small work
    assert(ep.last.normPrecision50 >= ep.head.normPrecision50 - 0.05,
      s"precision at finest rmax (${ep.last.normPrecision50}) should be >= coarsest (${ep.head.normPrecision50})")
    assert(ep.last.normPrecision50 > 0.8, s"finest precision ${ep.last.normPrecision50}")
  }
}
