package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.GraphGen

class HarnessSpec extends AnyFunSuite {

  private lazy val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.15, 1), 0.9, seed = 1)
  private lazy val sources = g.sampleSourcesByDegree(2, seed = 7)

  test("formatTable pads columns") {
    val t = Harness.formatTable(Seq("a", "bbbb"), Seq(Seq("xx", "y"), Seq("z", "wwwww")))
    val lines = t.split("\n")
    assert(lines.length == 3)
    assert(lines.map(_.length).distinct.size == 1, "all lines same width")
  }

  test("fmtD formats scales sensibly") {
    assert(Harness.fmtD(0) == "0")
    assert(Harness.fmtD(1234567) == "1.235e+06")
    assert(Harness.fmtD(3.14159) == "3.142")
    assert(Harness.fmtD(0.000123).contains("e-04"))
  }

  test("evaluate returns all six metrics in range") {
    val truth = repro.core.PowerMethodSeq.groundTruth(g, sources(0), 0.2)
    val est = repro.core.LocalPushSeq.compute(g, sources(0), 0.2, 1e-4).pi
    val (l1, mae, nmae, p50, np50, cond) = Harness.evaluate(g, est, truth)
    assert(l1 >= 0 && mae >= 0 && nmae >= 0)
    assert(p50 >= 0 && p50 <= 1)
    assert(np50 >= 0 && np50 <= 1)
    assert(cond > 0 && cond <= 1)
  }

  test("addErrSweep produces rows for all five methods") {
    val rows = Harness.addErrSweep("test", g, sources,
      rmaxValues = Seq(1e-3), deltas = Seq(1e-1))
    assert(rows.map(_.method).toSet ==
      Set("EdgePush-Add", "MAPPR", "MC", "FORA", "SpeedPPR"))
    rows.foreach { r =>
      assert(r.work >= 0 && r.millis >= 0)
      assert(r.normMaxAddErr >= 0)
    }
  }

  test("addErrSweep: EdgePush error respects the rmax budget") {
    val rows = Harness.addErrSweep("test", g, sources,
      rmaxValues = Seq(1e-4), deltas = Seq())
    val ep = rows.find(_.method == "EdgePush-Add").get
    assert(ep.normMaxAddErr <= 1e-4 + 1e-12)
  }

  test("l1Sweep produces rows for all three methods with valid errors") {
    val rows = Harness.l1Sweep("test", g, sources,
      epsValues = Seq(1e-2), powerIters = Seq(5))
    assert(rows.map(_.method).toSet == Set("EdgePush-L1", "PowForPush", "PowerMethod"))
    val ep = rows.find(_.method == "EdgePush-L1").get
    assert(ep.l1 <= 1e-2 + 1e-9)
    val pfp = rows.find(_.method == "PowForPush").get
    assert(pfp.l1 <= 1e-2 + 1e-9)
  }

  test("table1Row: ratios are positive and predictions in (0,1]") {
    val row = Harness.table1Row("g", g, sources, eps = 1e-3, rmax = 1e-5)
    assert(row.predictedL1Ratio > 0 && row.predictedL1Ratio <= 1)
    assert(row.predictedRmaxRatio > 0 && row.predictedRmaxRatio <= 1)
    assert(row.measuredL1Ratio > 0)
    assert(row.measuredRmaxRatio > 0)
    assert(row.localPushWorkL1 > 0 && row.edgePushWorkL1 > 0)
  }

  test("sweepTable renders one line per row plus header") {
    val rows = Harness.addErrSweep("t", g, sources.take(1),
      rmaxValues = Seq(1e-3), deltas = Seq())
    val table = Harness.sweepTable(rows)
    assert(table.split("\n").length == rows.length + 1)
  }
}
