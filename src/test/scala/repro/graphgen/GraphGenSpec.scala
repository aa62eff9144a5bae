package repro.graphgen

import org.scalatest.funsuite.AnyFunSuite
import repro.metrics.Unbalancedness

class GraphGenSpec extends AnyFunSuite {

  test("unbalancedStar: structure of the Figure-1 bad case") {
    val n = 50
    val g = GraphGen.unbalancedStar(n)
    assert(g.n == n + 1)
    assert(g.m == n) // n-1 star edges + 1 pendant
    assert(g.nbrCount(0) == n - 1)
    // u's degree is exactly 1 (the paper's normalization).
    assert(math.abs(g.deg(0) - 1.0) < 1e-12)
  }

  test("unbalancedStar: heavy edge takes 1-1/n of u's weight") {
    val n = 50
    val g = GraphGen.unbalancedStar(n)
    assert(math.abs(g.weightOf(0, 1) - (1.0 - 1.0 / n)) < 1e-12)
    // light edges share 1/n evenly
    val light = g.weightOf(0, 2)
    assert(math.abs(light * (n - 2) - 1.0 / n) < 1e-12)
  }

  test("unbalancedStar: cos2phi shrinks with n") {
    val c1 = Unbalancedness.cos2Phi(GraphGen.unbalancedStar(20))
    val c2 = Unbalancedness.cos2Phi(GraphGen.unbalancedStar(200))
    assert(c2 < c1)
    assert(c2 < 0.1, s"cos2phi=$c2 should be tiny for a severely unbalanced star")
  }

  test("unbalancedComplete: every node is (1/n',1-1/n')-unbalanced-ish") {
    val n = 40
    val g = GraphGen.unbalancedComplete(n)
    assert(g.m == n * (n - 1) / 2)
    (0 until n).foreach { u =>
      val (a, b) = Unbalancedness.tightestAB(g, u)
      assert(a <= 2.0 / (n - 1) + 1e-9, s"node $u a=$a")
      assert(b >= 0.85, s"node $u b=$b")
    }
  }

  test("unbalancedComplete: cos2phi = O(1/n)") {
    val g = GraphGen.unbalancedComplete(60)
    val c = Unbalancedness.cos2Phi(g)
    assert(c < 10.0 / 60, s"cos2phi=$c")
  }

  test("uniformComplete: cos2phi is exactly 1") {
    val g = GraphGen.uniformComplete(30)
    assert(math.abs(Unbalancedness.cos2Phi(g) - 1.0) < 1e-12)
  }

  test("chungLu: produces a graph with roughly the requested density") {
    val g = GraphGen.chungLu(2000, avgDeg = 10, beta = 2.5, seed = 3)
    val avg = 2.0 * g.m / g.n
    assert(avg > 4 && avg < 14, s"avg degree $avg, wanted ~10")
  }

  test("chungLu: degree sequence is skewed (power-law-like)") {
    val g = GraphGen.chungLu(2000, avgDeg = 10, beta = 2.2, seed = 3)
    val degs = (0 until g.n).map(g.nbrCount).sorted.reverse
    // max degree should far exceed the average for a power-law graph
    assert(degs.head > 5 * (2.0 * g.m / g.n), s"max=${degs.head}")
  }

  test("chungLu is deterministic in the seed") {
    val g1 = GraphGen.chungLu(500, 8, 2.5, seed = 4)
    val g2 = GraphGen.chungLu(500, 8, 2.5, seed = 4)
    assert(g1.m == g2.m)
    assert(g1.nbr.toSeq == g2.nbr.toSeq)
  }

  test("withParetoWeights: preserves topology, changes weights") {
    val base = GraphGen.chungLu(500, 8, 2.5, seed = 4)
    val w = GraphGen.withParetoWeights(base, alpha = 0.8, seed = 5)
    assert(w.m == base.m)
    // same undirected edge set (adjacency ordering may differ)
    assert(GraphGen.undirectedEdges(w).map { case (u, v, _) => (u, v) }.toSet ==
      GraphGen.undirectedEdges(base).map { case (u, v, _) => (u, v) }.toSet)
    assert(w.wgt.forall(_ >= 1.0 - 1e-12)) // Pareto xm = 1
  }

  test("withParetoWeights: heavier tail lowers cos2phi") {
    val base = GraphGen.chungLu(800, 10, 2.5, seed = 6)
    val heavy = GraphGen.withParetoWeights(base, alpha = 0.6, seed = 7)
    val light = GraphGen.withParetoWeights(base, alpha = 3.0, seed = 7)
    assert(Unbalancedness.cos2Phi(heavy) < Unbalancedness.cos2Phi(light))
  }

  test("withUniformWeights: near-balanced weights give cos2phi near 1") {
    val base = GraphGen.chungLu(800, 10, 2.5, seed = 6)
    val g = GraphGen.withUniformWeights(base, jitter = 0.2, seed = 8)
    assert(Unbalancedness.cos2Phi(g) > 0.95)
  }

  test("undirectedEdges emits each edge once with u < v") {
    val g = GraphGen.randomGraph(30, 0.2, seed = 9)
    val es = GraphGen.undirectedEdges(g)
    assert(es.size == g.m)
    assert(es.forall { case (u, v, _) => u < v })
    assert(es.map { case (u, v, _) => (u, v) }.distinct.size == es.size)
  }

  test("randomGraph: contains the spanning path (connected backbone)") {
    val g = GraphGen.randomGraph(25, 0.05, seed = 10)
    (0 until 24).foreach(i => assert(g.weightOf(i, i + 1) > 0))
  }

  for (seed <- 1 to 5)
    test(s"randomGraph: symmetric adjacency (seed=$seed)") {
      val g = GraphGen.randomGraph(20, 0.3, seed)
      for (u <- 0 until g.n; e <- g.indptr(u) until g.indptr(u + 1))
        assert(math.abs(g.weightOf(g.nbr(e), u) - g.wgt(e)) < 1e-12)
    }
}
