package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.WeightedGraph
import repro.graphgen.GraphGen
import repro.metrics.Errors

class LocalPushSeqSpec extends AnyFunSuite {

  private val alpha = 0.2

  test("terminal residues are all below d(u)*theta") {
    val g = GraphGen.randomGraph(50, 0.1, 1)
    val theta = 1e-4
    val (_, r) = LocalPushSeq.run(g, 0, alpha, theta)
    (0 until g.n).foreach(u =>
      assert(r(u) < g.deg(u) * theta + 1e-15 || g.deg(u) == 0, s"node $u r=${r(u)}"))
  }

  test("reserve underestimates the true PPR everywhere") {
    val g = GraphGen.randomGraph(40, 0.15, 2)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val pi = LocalPushSeq.compute(g, 0, alpha, 1e-4).pi
    (0 until g.n).foreach(u => assert(pi(u) <= exact(u) + 1e-9))
  }

  test("Lemma 1 invariant: pi(t) = pî(t) + sum_u r(u)*pi_u(t)") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.25, 3), 1.2, seed = 3)
    val s = 0
    val (res, r) = LocalPushSeq.run(g, s, alpha, 1e-3)
    val pi = res.pi
    val exactS = TestUtil.exactPpr(g, s, alpha)
    // For a handful of targets t, check the invariant using exact π_u(t).
    val exactFrom = (0 until g.n).filter(r(_) > 0).map(u => u -> TestUtil.exactPpr(g, u, alpha)).toMap
    Seq(0, 1, g.n / 2, g.n - 1).foreach { t =>
      val rhs = pi(t) + exactFrom.map { case (u, pu) => r(u) * pu(t) }.sum
      assert(math.abs(exactS(t) - rhs) < 1e-9, s"t=$t exact=${exactS(t)} rhs=$rhs")
    }
  }

  for (seed <- 1 to 5)
    test(s"Fact 1: l1 error ≤ eps with theta = eps/||A||_1 (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.2, seed), 0.9, seed = seed)
      val s = g.sampleSourcesByDegree(1, seed)(0)
      val eps = 1e-2
      val pi = LocalPushSeq.compute(g, s, alpha, Thresholds.localPushL1Theta(g, eps)).pi
      val exact = TestUtil.exactPpr(g, s, alpha)
      assert(Errors.l1(pi, exact) <= eps + 1e-9)
    }

  for (seed <- 1 to 5)
    test(s"Fact 2: normalized additive error ≤ rmax with theta = rmax (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.2, seed), 0.9, seed = seed)
      val s = g.sampleSourcesByDegree(1, seed)(0)
      val rmax = 1e-3
      val pi = LocalPushSeq.compute(g, s, alpha, rmax).pi
      val exact = TestUtil.exactPpr(g, s, alpha)
      (0 until g.n).foreach { u =>
        if (g.deg(u) > 0)
          assert(math.abs(pi(u) - exact(u)) / g.deg(u) <= rmax + 1e-12, s"node $u")
      }
    }

  test("smaller theta gives more accurate results and more work") {
    val g = GraphGen.randomGraph(60, 0.1, 4)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val coarse = LocalPushSeq.compute(g, 0, alpha, 1e-2)
    val fine = LocalPushSeq.compute(g, 0, alpha, 1e-5)
    assert(Errors.l1(fine.pi, exact) < Errors.l1(coarse.pi, exact))
    assert(fine.edgeTouches > coarse.edgeTouches)
  }

  test("source with huge theta performs no pushes") {
    val g = GraphGen.randomGraph(20, 0.2, 5)
    val res = LocalPushSeq.compute(g, 0, alpha, theta = 1e6)
    assert(res.pushOps == 0)
    assert(res.pi.forall(_ == 0.0))
  }

  test("edgeTouches equals sum of n(u) over pushes on a star") {
    val n = 11
    val edges = (1 until n).map(v => (0, v, 1.0))
    val g = WeightedGraph.fromUndirectedEdges(n, edges)
    // θ large enough that only the source (center) pushes once.
    val res = LocalPushSeq.compute(g, 0, alpha, theta = 0.09)
    assert(res.pushOps == 1)
    assert(res.edgeTouches == n - 1)
  }

  test("deterministic: repeated runs give identical results") {
    val g = GraphGen.randomGraph(30, 0.2, 6)
    val a = LocalPushSeq.compute(g, 2, alpha, 1e-4)
    val b = LocalPushSeq.compute(g, 2, alpha, 1e-4)
    assert(a.pi.toSeq == b.pi.toSeq && a.pushOps == b.pushOps)
  }

  test("work scales like 1/theta (Lemma 11 trend)") {
    val g = GraphGen.randomGraph(80, 0.1, 7)
    val w1 = LocalPushSeq.compute(g, 0, alpha, 1e-3).edgeTouches
    val w2 = LocalPushSeq.compute(g, 0, alpha, 1e-5).edgeTouches
    assert(w2 > w1)
    assert(w2 < 300L * w1, "work should not blow up faster than 1/theta by orders")
  }
}
