package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.Datasets
import repro.harness.Harness

/** Reproduces the §6.1/§6.2 conductance content of Figures 6/9/15 as a
  * table: sweep-cut conductance of the ranked estimate vs query cost
  * (the local-clustering application).
  *
  * Paper claim: under equal query cost, EdgePush reaches smaller
  * conductance than the baselines.
  */
class ConductanceBench extends AnyFunSuite {

  private val scale = 2500

  private lazy val rows = {
    val g = Datasets.byKey("YT").build(scale) // motif graph = MAPPR's habitat
    val sources = g.sampleSourcesByDegree(5, seed = 7)
    Harness.addErrSweep("YT", g, sources,
      rmaxValues = Seq(1e-4, 1e-5, 1e-6), deltas = Seq(1e-2, 1e-3))
  }

  test("conductance vs cost table (Figures 6/9/15)") {
    println("\n== conductance vs query cost (motif graph YT) ==")
    println(Harness.sweepTable(rows))
    assert(rows.nonEmpty)
  }

  test("shape: conductance improves (or holds) as EdgePush spends more work") {
    val ep = rows.filter(_.method == "EdgePush-Add").sortBy(-_.param)
    assert(ep.last.conductance <= ep.head.conductance + 0.05,
      s"conductances along sweep: ${ep.map(_.conductance)}")
  }

  test("shape: at matched rmax, EdgePush reaches MAPPR-level conductance cheaper") {
    val ep = rows.find(r => r.method == "EdgePush-Add" && r.param == 1e-6).get
    val lp = rows.find(r => r.method == "MAPPR" && r.param == 1e-6).get
    assert(math.abs(ep.conductance - lp.conductance) < 0.1,
      s"EdgePush ${ep.conductance} vs MAPPR ${lp.conductance}")
    assert(ep.work <= lp.work)
  }
}
