package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.WeightedGraph
import repro.graphgen.GraphGen
import repro.metrics.Errors

class MonteCarloSeqSpec extends AnyFunSuite {

  private val alpha = 0.2

  test("walkCount formula matches the FORA/SpeedPPR setting") {
    // W = (2ε_r/3 + 2)·ln(2/p_f)/(ε_r²·δ)
    val w = MonteCarloSeq.walkCount(delta = 0.01, epsR = 0.5, pf = 0.001)
    val want = math.ceil((2 * 0.5 / 3 + 2) * math.log(2000.0) / (0.25 * 0.01))
    assert(w == want.toLong)
  }

  test("walkCount grows as delta shrinks") {
    assert(MonteCarloSeq.walkCount(1e-3, 0.5, 0.01) > MonteCarloSeq.walkCount(1e-2, 0.5, 0.01))
  }

  test("estimate is a probability distribution") {
    val g = GraphGen.randomGraph(20, 0.3, 1)
    val pi = MonteCarloSeq.compute(g, 0, alpha, walks = 5000, seed = 1).pi
    assert(math.abs(pi.sum - 1.0) < 1e-9)
    assert(pi.forall(_ >= 0))
  }

  test("estimate converges to exact PPR with many walks") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(15, 0.3, 2), 1.5, seed = 2)
    val exact = TestUtil.exactPpr(g, 0, alpha)
    val pi = MonteCarloSeq.compute(g, 0, alpha, walks = 200000, seed = 3).pi
    assert(Errors.l1(pi, exact) < 0.05, s"l1=${Errors.l1(pi, exact)}")
  }

  test("weighted sampling: neighbor probability proportional to edge weight") {
    // star: center 0 with weights 9 and 1 — walks stopping at leaf 1 should
    // be ~9x those at leaf 2 (conditioned on leaving the center once).
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 9.0), (0, 2, 1.0)))
    val pi = MonteCarloSeq.compute(g, 0, alpha, walks = 100000, seed = 4).pi
    val ratio = pi(1) / pi(2)
    assert(ratio > 6 && ratio < 13, s"ratio=$ratio want ~9")
  }

  test("deterministic in the seed") {
    val g = GraphGen.randomGraph(20, 0.2, 5)
    val a = MonteCarloSeq.compute(g, 0, alpha, 1000, seed = 7).pi
    val b = MonteCarloSeq.compute(g, 0, alpha, 1000, seed = 7).pi
    val c = MonteCarloSeq.compute(g, 0, alpha, 1000, seed = 8).pi
    assert(a.toSeq == b.toSeq)
    assert(a.toSeq != c.toSeq)
  }

  test("mean walk length tracks 1/alpha - 1 moves per walk") {
    val g = GraphGen.uniformComplete(10)
    val walks = 20000L
    val res = MonteCarloSeq.compute(g, 0, alpha, walks, seed = 6)
    val meanSteps = res.walkSteps.toDouble / walks
    // Geometric: expected moves = (1-α)/α = 4
    assert(meanSteps > 3.5 && meanSteps < 4.5, s"meanSteps=$meanSteps")
  }

  test("AliasIndex samples every neighbor of a uniform star") {
    val edges = (1 until 6).map(v => (0, v, 1.0))
    val g = WeightedGraph.fromUndirectedEdges(6, edges)
    val idx = new MonteCarloSeq.AliasIndex(g)
    val rnd = new scala.util.Random(1)
    val seen = (1 to 2000).map(_ => idx.sample(g, 0, rnd)).toSet
    assert(seen == (1 until 6).toSet)
  }
}
