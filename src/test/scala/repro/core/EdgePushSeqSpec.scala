package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graphgen.{Affinity, GraphGen}
import repro.metrics.Errors

class EdgePushSeqSpec extends AnyFunSuite {

  private val alpha = 0.2

  test("terminal edge residues are all below theta(u,v) (Algorithm 2 termination)") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.15, 1), 0.9, seed = 1)
    val theta = Thresholds.l1(g, 1e-3)
    val (_, residues) = EdgePushSeq.computeWithResidues(g, 0, alpha, theta)
    residues.indices.foreach(e =>
      assert(residues(e) < theta(e) + 1e-12, s"edge $e residue=${residues(e)} theta=${theta(e)}"))
  }

  test("edge residues are never negative") {
    val g = GraphGen.randomGraph(30, 0.2, 2)
    val (_, residues) = EdgePushSeq.computeWithResidues(g, 1, alpha, Thresholds.l1(g, 1e-4))
    residues.foreach(r => assert(r >= -1e-12))
  }

  test("estimate underestimates the true PPR everywhere (Invariant 6)") {
    val g = GraphGen.randomGraph(35, 0.2, 3)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val pi = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, 1e-3)).pi
    (0 until g.n).foreach(u => assert(pi(u) <= exact(u) + 1e-9))
  }

  for (seed <- 1 to 6)
    test(s"Theorem 2: l1 error ≤ eps with optimal thresholds (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.2, seed), 0.8, seed = seed)
      val s = g.sampleSourcesByDegree(1, seed)(0)
      val eps = 1e-2
      val pi = EdgePushSeq.compute(g, s, alpha, Thresholds.l1(g, eps)).pi
      val exact = TestUtil.exactPpr(g, s, alpha)
      assert(Errors.l1(pi, exact) <= eps + 1e-9)
    }

  for (seed <- 1 to 6)
    test(s"Theorem 3: normalized additive error ≤ rmax (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.2, seed), 0.8, seed = seed)
      val s = g.sampleSourcesByDegree(1, seed)(0)
      val rmax = 1e-3
      val pi = EdgePushSeq.compute(g, s, alpha, Thresholds.rmax(g, rmax)).pi
      val exact = TestUtil.exactPpr(g, s, alpha)
      (0 until g.n).foreach { u =>
        if (g.deg(u) > 0)
          assert(math.abs(pi(u) - exact(u)) / g.deg(u) <= rmax + 1e-12,
            s"node $u err=${math.abs(pi(u) - exact(u)) / g.deg(u)}")
      }
    }

  test("Lemma 2 invariant: pi(t) = alpha*q(t) + sum_e R_e * pi_v(t)") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(20, 0.3, 4), 1.0, seed = 4)
    val s = 0
    val (pi, residues) = EdgePushSeq.computeWithResidues(g, s, alpha, Thresholds.l1(g, 1e-2))
    val exactS = TestUtil.exactPpr(g, s, alpha)
    val exactFrom = (0 until g.n).map(v => v -> TestUtil.exactPpr(g, v, alpha)).toMap
    Seq(0, 1, g.n / 2, g.n - 1).foreach { t =>
      var rhs = pi(t)
      var u = 0
      while (u < g.n) {
        var e = g.indptr(u)
        while (e < g.indptr(u + 1)) {
          rhs += residues(e) * exactFrom(g.nbr(e))(t)
          e += 1
        }
        u += 1
      }
      assert(math.abs(exactS(t) - rhs) < 1e-9, s"t=$t exact=${exactS(t)} rhs=$rhs")
    }
  }

  test("scan mode produces the same error guarantee as heap mode") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.2, 5), 0.8, seed = 5)
    val eps = 1e-3
    val theta = Thresholds.l1(g, eps)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val heap = EdgePushSeq.compute(g, 0, alpha, theta, scanSwitchFrac = None)
    val scan = EdgePushSeq.compute(g, 0, alpha, theta, scanSwitchFrac = Some(0.0))
    assert(Errors.l1(heap.pi, exact) <= eps + 1e-9)
    assert(Errors.l1(scan.pi, exact) <= eps + 1e-9)
    // both terminate with all residues < θ; estimates agree up to 2ε
    assert(Errors.l1(heap.pi, scan.pi) <= 2 * eps + 1e-9)
  }

  test("Figure 1 bad case: EdgePush does far fewer edge touches than LocalPush") {
    // ℓ1 regime: with θ(u,v) ∝ √A_uv, the light edges (weight ~1/n²) fall
    // below threshold and are never pushed, while LocalPush's node-atomic
    // push touches all n-1 edges of the center every time.
    val n = 2000
    val g = GraphGen.unbalancedStar(n)
    val eps = 0.01
    val lp = LocalPushSeq.compute(g, 0, alpha, Thresholds.localPushL1Theta(g, eps))
    val ep = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, eps))
    assert(ep.totalWork * 10 < lp.totalWork,
      s"EdgePush=${ep.totalWork} LocalPush=${lp.totalWork}")
  }

  test("unbalanced complete graph: measured advantage tracks O(n) prediction") {
    val n = 150
    val g = GraphGen.unbalancedComplete(n)
    val eps = 1e-3
    val lp = LocalPushSeq.compute(g, 0, alpha, Thresholds.localPushL1Theta(g, eps))
    val ep = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, eps))
    val ratio = ep.totalWork.toDouble / lp.totalWork
    assert(ratio < 0.5, s"ratio=$ratio should be well below 1 on the unbalanced complete graph")
  }

  test("uniform-weight graph: EdgePush work is comparable to LocalPush (no advantage)") {
    val g = GraphGen.uniformComplete(60)
    val rmax = 1e-5
    val lp = LocalPushSeq.compute(g, 0, alpha, rmax)
    val ep = EdgePushSeq.compute(g, 0, alpha, Thresholds.rmax(g, rmax))
    // cos²φ = 1: EdgePush may still be up to (1-α) cheaper but not more
    // than ~an order in either direction.
    val ratio = ep.totalWork.toDouble / lp.totalWork
    assert(ratio > 0.1 && ratio < 3.0, s"ratio=$ratio")
  }

  test("affinity graph (unbalanced): EdgePush beats LocalPush clearly") {
    val g = Affinity.graph(200, Affinity.paperConfigs(0), seed = 17)
    val rmax = 1e-5
    val lp = LocalPushSeq.compute(g, g.sampleSourcesByDegree(1, 3)(0), alpha, rmax)
    val ep = EdgePushSeq.compute(g, g.sampleSourcesByDegree(1, 3)(0), alpha,
      Thresholds.rmax(g, rmax))
    assert(ep.totalWork * 2 < lp.totalWork,
      s"EdgePush=${ep.totalWork} LocalPush=${lp.totalWork}")
  }

  test("deterministic: repeated runs identical") {
    val g = GraphGen.randomGraph(30, 0.2, 6)
    val theta = Thresholds.l1(g, 1e-4)
    val a = EdgePushSeq.compute(g, 2, alpha, theta)
    val b = EdgePushSeq.compute(g, 2, alpha, theta)
    assert(a.pi.toSeq == b.pi.toSeq && a.pushOps == b.pushOps)
  }

  test("pushOps grow as eps shrinks") {
    val g = GraphGen.randomGraph(60, 0.1, 7)
    val a = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, 1e-2))
    val b = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, 1e-4))
    assert(b.pushOps > a.pushOps)
  }

  test("isolated-source query returns e_s-scaled estimate without crashing") {
    val g = repro.graph.WeightedGraph.fromUndirectedEdges(4, Seq((1, 2, 1.0)))
    val res = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, 1e-3))
    assert(res.pushOps == 0)
    assert(res.pi(0) == alpha * 1.0) // α·q with q = e_s
  }

  test("Lemma 3 bound: pushes ≤ sum over edges of (1-a)*pi(u)*A_uv/(a*d(u)*theta_uv)") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.25, 8), 0.9, seed = 8)
    val s = 0
    val theta = Thresholds.l1(g, 1e-2)
    val res = EdgePushSeq.compute(g, s, alpha, theta)
    val exact = TestUtil.exactPpr(g, s, alpha)
    var bound = 0.0
    var u = 0
    while (u < g.n) {
      if (g.deg(u) > 0) {
        var e = g.indptr(u)
        while (e < g.indptr(u + 1)) {
          bound += (1 - alpha) * exact(u) * g.wgt(e) / (alpha * g.deg(u) * theta(e)) + 1
          e += 1
        }
      }
      u += 1
    }
    assert(res.pushOps <= bound, s"pushes=${res.pushOps} bound=$bound")
  }
}
