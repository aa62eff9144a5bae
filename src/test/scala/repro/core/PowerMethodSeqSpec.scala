package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graphgen.GraphGen

class PowerMethodSeqSpec extends AnyFunSuite {

  test("mass conservation: the iterate always sums to 1") {
    val g = GraphGen.randomGraph(30, 0.2, 1)
    for (iters <- Seq(1, 5, 20, 100)) {
      val pi = PowerMethodSeq.compute(g, 0, 0.2, iters).pi
      assert(math.abs(pi.sum - 1.0) < 1e-9, s"iters=$iters sum=${pi.sum}")
    }
  }

  for (seed <- 1 to 6)
    test(s"converges to the exact dense-solve PPR (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.25, seed), 1.0, seed = seed)
      val s = g.sampleSourcesByDegree(1, seed)(0)
      val exact = TestUtil.exactPpr(g, s, 0.2)
      val pm = PowerMethodSeq.groundTruth(g, s, 0.2)
      assert(TestUtil.l1Diff(pm, exact) < 1e-8)
    }

  test("error decays geometrically with iterations") {
    val g = GraphGen.randomGraph(40, 0.15, 2)
    val exact = TestUtil.exactPpr(g, 1, 0.2)
    val errs = Seq(2, 6, 12, 24).map(it =>
      TestUtil.l1Diff(PowerMethodSeq.compute(g, 1, 0.2, it).pi, exact))
    assert(errs(0) > errs(1) && errs(1) > errs(2) && errs(2) > errs(3))
    // α = 0.2 ⇒ error ≤ (1-α)^L
    errs.zip(Seq(2, 6, 12, 24)).foreach { case (e, l) =>
      assert(e <= math.pow(0.8, l) + 1e-9, s"L=$l err=$e")
    }
  }

  test("two-node closed form: pi(s) = alpha/(1-(1-alpha)^2) style balance") {
    // single edge 0–1, α-walk alternates; exact by dense solve.
    val g = repro.graph.WeightedGraph.fromUndirectedEdges(2, Seq((0, 1, 1.0)))
    val alpha = 0.2
    val pi = PowerMethodSeq.groundTruth(g, 0, alpha)
    // closed form: π(0) = 1/(2-α), π(1) = (1-α)/(2-α)
    assert(math.abs(pi(0) - 1.0 / (2 - alpha)) < 1e-9)
    assert(math.abs(pi(1) - (1 - alpha) / (2 - alpha)) < 1e-9)
  }

  test("weights matter: heavier edge attracts more mass") {
    val g = repro.graph.WeightedGraph.fromUndirectedEdges(3,
      Seq((0, 1, 10.0), (0, 2, 1.0)))
    val pi = PowerMethodSeq.groundTruth(g, 0, 0.2)
    assert(pi(1) > 5 * pi(2), s"pi=${pi.toSeq}")
  }

  test("edgeTouches accounting: iters * 2m") {
    val g = GraphGen.randomGraph(20, 0.2, 3)
    val res = PowerMethodSeq.compute(g, 0, 0.2, 7)
    assert(res.edgeTouches == 7L * g.directedEdgeCount)
  }

  test("isolated source keeps all mass") {
    val g = repro.graph.WeightedGraph.fromUndirectedEdges(3, Seq((1, 2, 1.0)))
    val pi = PowerMethodSeq.groundTruth(g, 0, 0.2)
    assert(math.abs(pi(0) - 1.0) < 1e-9)
  }

  test("symmetry: on a uniform complete graph all non-source nodes are equal") {
    val g = GraphGen.uniformComplete(6)
    val pi = PowerMethodSeq.groundTruth(g, 0, 0.2)
    val others = (1 until 6).map(pi(_))
    assert(others.max - others.min < 1e-12)
    assert(pi(0) > others.head)
  }
}
