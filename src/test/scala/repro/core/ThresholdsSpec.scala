package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.GraphGen

class ThresholdsSpec extends AnyFunSuite {

  private def graphs = (1 to 5).map(s =>
    GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.2, s), 0.8, seed = s))

  test("l1 thresholds sum to exactly epsilon (Theorem 2 error budget)") {
    graphs.foreach { g =>
      val eps = 1e-3
      val theta = Thresholds.l1(g, eps)
      assert(math.abs(theta.sum - eps) < 1e-12, s"sum=${theta.sum}")
    }
  }

  test("l1 thresholds are proportional to sqrt(weight)") {
    graphs.foreach { g =>
      val theta = Thresholds.l1(g, 1e-3)
      val ratios = theta.indices.map(e => theta(e) / math.sqrt(g.wgt(e)))
      assert(ratios.max - ratios.min < 1e-15)
    }
  }

  test("rmax thresholds satisfy the Lemma-12 local constraint: " +
    "sum over in-edges of v equals rmax*d(v)") {
    graphs.foreach { g =>
      val rm = 1e-4
      val theta = Thresholds.rmax(g, rm)
      val perDst = new Array[Double](g.n)
      var e = 0
      while (e < theta.length) { perDst(g.nbr(e)) += theta(e); e += 1 }
      (0 until g.n).foreach { v =>
        if (g.deg(v) > 0)
          assert(math.abs(perDst(v) - rm * g.deg(v)) < 1e-9 * math.max(1, g.deg(v)),
            s"node $v: ${perDst(v)} vs ${rm * g.deg(v)}")
      }
    }
  }

  test("all thresholds are strictly positive") {
    graphs.foreach { g =>
      assert(Thresholds.l1(g, 1e-5).forall(_ > 0))
      assert(Thresholds.rmax(g, 1e-5).forall(_ > 0))
    }
  }

  test("thresholds reject non-positive error budgets") {
    val g = graphs.head
    intercept[IllegalArgumentException](Thresholds.l1(g, 0.0))
    intercept[IllegalArgumentException](Thresholds.rmax(g, -1.0))
  }

  test("localPushL1Theta: eps over total weight (Fact 1)") {
    val g = graphs.head
    assert(math.abs(Thresholds.localPushL1Theta(g, 0.01) - 0.01 / g.totalWeight) < 1e-15)
  }

  test("on unweighted graphs l1 thresholds are uniform eps/2m") {
    val g = GraphGen.uniformComplete(10)
    val theta = Thresholds.l1(g, 1e-2)
    theta.foreach(t => assert(math.abs(t - 1e-2 / g.directedEdgeCount) < 1e-15))
  }

  test("on unweighted graphs rmax thresholds reduce to LocalPush's rmax scaling") {
    // uniform weights: θ(u,v) = rmax·d(v)·1/n(v) = rmax·w — per-edge share
    val g = GraphGen.uniformComplete(8)
    val theta = Thresholds.rmax(g, 1e-3)
    theta.foreach(t => assert(math.abs(t - 1e-3) < 1e-15)) // w = 1, d(v)/n(v) = 1
  }

  test("PprResult: totalWork and wallMillis") {
    val r = PprResult(Array(1.0), 2, 30, 12, 5_000_000L)
    assert(r.totalWork == 42)
    assert(math.abs(r.wallMillis - 5.0) < 1e-9)
  }
}
