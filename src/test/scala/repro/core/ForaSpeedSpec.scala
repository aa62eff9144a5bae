package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graphgen.GraphGen
import repro.metrics.Errors

/** FORA and SpeedPPR share their parameterization; test them together. */
class ForaSpeedSpec extends AnyFunSuite {

  private val alpha = 0.2

  test("FORA: estimate is close to exact PPR at small delta") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.25, 1), 1.2, seed = 1)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val pi = ForaSeq.compute(g, 0, alpha, delta = 1e-4, seed = 2).pi
    assert(Errors.l1(pi, exact) < 0.05, s"l1=${Errors.l1(pi, exact)}")
  }

  test("FORA: error decreases as delta shrinks") {
    val g = GraphGen.randomGraph(30, 0.2, 2)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val coarse = Errors.l1(ForaSeq.compute(g, 0, alpha, 1e-1, seed = 3).pi, exact)
    val fine = Errors.l1(ForaSeq.compute(g, 0, alpha, 1e-4, seed = 3).pi, exact)
    assert(fine < coarse, s"fine=$fine coarse=$coarse")
  }

  test("FORA: estimate sums to ~1 (push reserve + compensated residues)") {
    val g = GraphGen.randomGraph(25, 0.25, 3)
    val pi = ForaSeq.compute(g, 0, alpha, 1e-3, seed = 4).pi
    assert(math.abs(pi.sum - 1.0) < 0.05, s"sum=${pi.sum}")
  }

  test("FORA: combines push and walk work") {
    val g = GraphGen.randomGraph(40, 0.15, 4)
    val res = ForaSeq.compute(g, 0, alpha, 1e-3, seed = 5)
    assert(res.edgeTouches > 0, "push phase should do work")
    assert(res.walkSteps > 0, "walk phase should do work")
  }

  test("FORA: deterministic in the seed") {
    val g = GraphGen.randomGraph(20, 0.2, 5)
    val a = ForaSeq.compute(g, 0, alpha, 1e-2, seed = 6).pi
    val b = ForaSeq.compute(g, 0, alpha, 1e-2, seed = 6).pi
    assert(a.toSeq == b.toSeq)
  }

  test("SpeedPPR: estimate is close to exact PPR at small delta") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.25, 6), 1.2, seed = 6)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val pi = SpeedPprSeq.compute(g, 0, alpha, delta = 1e-4, seed = 7).pi
    assert(Errors.l1(pi, exact) < 0.05, s"l1=${Errors.l1(pi, exact)}")
  }

  test("SpeedPPR: error decreases as delta shrinks") {
    val g = GraphGen.randomGraph(30, 0.2, 7)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val coarse = Errors.l1(SpeedPprSeq.compute(g, 0, alpha, 1e-1, seed = 8).pi, exact)
    val fine = Errors.l1(SpeedPprSeq.compute(g, 0, alpha, 1e-4, seed = 8).pi, exact)
    assert(fine < coarse)
  }

  test("SpeedPPR: deterministic in the seed") {
    val g = GraphGen.randomGraph(20, 0.2, 8)
    val a = SpeedPprSeq.compute(g, 0, alpha, 1e-2, seed = 9).pi
    val b = SpeedPprSeq.compute(g, 0, alpha, 1e-2, seed = 9).pi
    assert(a.toSeq == b.toSeq)
  }

  test("SpeedPPR and FORA agree with each other at small delta") {
    val g = GraphGen.randomGraph(25, 0.25, 9)
    val a = ForaSeq.compute(g, 0, alpha, 1e-4, seed = 10).pi
    val b = SpeedPprSeq.compute(g, 0, alpha, 1e-4, seed = 10).pi
    assert(Errors.l1(a, b) < 0.05)
  }

  test("PowForPush: queue-only and scan-switching agree on the error bound") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.2, 10), 0.9, seed = 10)
    val eps = 1e-2
    val theta = Thresholds.localPushL1Theta(g, eps)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val queueOnly = LocalPushSeq.compute(g, 0, alpha, theta)
    val switching = PowForPushSeq.compute(g, 0, alpha, theta, scanSwitchFrac = 0.0)
    assert(Errors.l1(queueOnly.pi, exact) <= eps + 1e-9)
    assert(Errors.l1(switching.pi, exact) <= eps + 1e-9)
  }

  test("PowForPush with a high switch threshold behaves like LocalPush") {
    val g = GraphGen.randomGraph(30, 0.2, 11)
    val a = PowForPushSeq.compute(g, 0, alpha, 1e-4, scanSwitchFrac = 10.0)
    val b = LocalPushSeq.compute(g, 0, alpha, 1e-4)
    assert(TestUtil.l1Diff(a.pi, b.pi) < 1e-12)
    assert(a.pushOps == b.pushOps)
  }

  test("PowForPush scan mode terminates and respects the residue bound") {
    val g = GraphGen.randomGraph(50, 0.15, 12)
    val theta = 1e-5
    val res = PowForPushSeq.compute(g, 0, alpha, theta, scanSwitchFrac = 0.0)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    // Fact 1 guarantee via theta = eps/||A||1 ⇔ eps = theta*||A||1
    assert(Errors.l1(res.pi, exact) <= theta * g.totalWeight + 1e-9)
  }
}
