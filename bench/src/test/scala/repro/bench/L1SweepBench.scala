package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.Datasets
import repro.harness.Harness

/** Reproduces the §6.2 content of Figures 10/13/14 as tables: trade-offs
  * between query cost and actual ℓ1-error / MaxAddErr for EdgePush-ℓ1
  * (with scan switching) vs PowForPush vs Power Method.
  *
  * Paper claim: at relatively large ℓ1-error EdgePush is cheapest; as ε
  * shrinks the three curves converge (EdgePush must touch most edges).
  */
class L1SweepBench extends AnyFunSuite {

  private val scale = 2500
  private val epsValues = Seq(1e-1, 1e-2, 1e-3, 1e-4, 1e-5)

  private def sweep(key: String) = {
    val g = Datasets.byKey(key).build(scale)
    val sources = g.sampleSourcesByDegree(5, seed = 7)
    Harness.l1Sweep(key, g, sources, epsValues)
  }

  // All eight stand-ins, as in Figures 10 (motif) and 13/14 (real weighted).
  private lazy val rows =
    Seq("YT", "LJ", "IC", "OL", "TA", "TH", "BC", "SP").flatMap(sweep)

  test("§6.2 sweep table (Figures 10/13/14)") {
    println("\n== §6.2: l1 error sweeps ==")
    println(Harness.sweepTable(rows))
    assert(rows.nonEmpty)
  }

  test("shape: EdgePush-L1 cheapest at large eps on unbalanced datasets") {
    // The paper's claim lives at "relatively large ℓ1-error": before the
    // scan switch kicks in, EdgePush touches only heavy edges. The margin
    // tracks the unbalancedness: strict win on TA (cos²φ ≈ 0.4), and no
    // worse than a small factor on the milder BC (cos²φ ≈ 0.6), mirroring
    // Figure 13 where BC shows the smallest gap.
    val atTa = rows.filter(r => r.dataset == "TA" && r.param == 1e-1)
    val epTa = atTa.find(_.method == "EdgePush-L1").get
    val pfpTa = atTa.find(_.method == "PowForPush").get
    assert(epTa.work * 2 <= pfpTa.work,
      s"TA eps=1e-1: EdgePush ${epTa.work} not clearly below PowForPush ${pfpTa.work}")
    val atBc = rows.filter(r => r.dataset == "BC" && r.param == 1e-1)
    val epBc = atBc.find(_.method == "EdgePush-L1").get
    val pfpBc = atBc.find(_.method == "PowForPush").get
    assert(epBc.work <= 1.5 * pfpBc.work,
      s"BC eps=1e-1: EdgePush ${epBc.work} vs PowForPush ${pfpBc.work}")
  }

  test("shape: EdgePush and PowForPush costs converge as eps shrinks") {
    // Figure 10/13: the curves gradually overlap under strict ε — after
    // the switch both methods are scan-bound, within a small factor.
    Seq("TA", "BC", "TH").foreach { key =>
      val atEps = rows.filter(r => r.dataset == key && r.param == 1e-5)
      val ep = atEps.find(_.method == "EdgePush-L1").get
      val pfp = atEps.find(_.method == "PowForPush").get
      val ratio = ep.work / math.max(pfp.work, 1.0)
      assert(ratio < 2.5, s"$key at eps=1e-5: EdgePush/PowForPush ratio $ratio")
    }
  }

  test("shape: every method's l1 error decreases along its sweep") {
    Seq("EdgePush-L1", "PowForPush").foreach { m =>
      val ms = rows.filter(r => r.dataset == "BC" && r.method == m).sortBy(-_.param)
      assert(ms.last.l1 <= ms.head.l1 + 1e-9, s"$m: ${ms.map(_.l1)}")
    }
    val pm = rows.filter(r => r.dataset == "BC" && r.method == "PowerMethod").sortBy(_.param)
    assert(pm.last.l1 <= pm.head.l1 + 1e-9)
  }

  test("guarantee: EdgePush-L1 actual l1 error is within its eps budget") {
    rows.filter(_.method == "EdgePush-L1").foreach { r =>
      assert(r.l1 <= r.param + 1e-9, s"${r.dataset} eps=${r.param}: l1=${r.l1}")
    }
  }
}
