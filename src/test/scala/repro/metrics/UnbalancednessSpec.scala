package repro.metrics

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.WeightedGraph
import repro.graphgen.GraphGen

class UnbalancednessSpec extends AnyFunSuite {

  test("cos2phi = 1 on any uniform-weight graph (Cauchy–Schwarz equality)") {
    val g = GraphGen.uniformComplete(12)
    assert(math.abs(Unbalancedness.cos2Phi(g) - 1.0) < 1e-12)
  }

  for (seed <- 1 to 8)
    test(s"cos2phi ∈ (0, 1] on random weighted graphs (seed=$seed)") {
      val g = GraphGen.randomGraph(30, 0.2, seed)
      val c = Unbalancedness.cos2Phi(g)
      assert(c > 0 && c <= 1 + 1e-12, s"cos2phi=$c")
    }

  for (seed <- 1 to 8)
    test(s"cos2phi_v ∈ (0, 1] for all nodes (seed=$seed)") {
      val g = GraphGen.randomGraph(30, 0.2, seed)
      (0 until g.n).foreach { v =>
        val c = Unbalancedness.cos2PhiNode(g, v)
        assert(c > 0 && c <= 1 + 1e-12, s"node $v cos2phi_v=$c")
      }
    }

  test("cos2phi via characteristic vectors: manual check on a triangle") {
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 1.0), (1, 2, 4.0), (0, 2, 9.0)))
    // ζ entries over Ē: two copies each of 1, 2, 3 ⇒ Σ√A = 12
    // ‖A‖₁ = 28, 2m = 6, cos²φ = 144/(6·28)
    val want = 144.0 / (6 * 28)
    assert(math.abs(Unbalancedness.cos2Phi(g) - want) < 1e-12)
  }

  test("cos2PhiNode: manual check") {
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 1.0), (1, 2, 4.0), (0, 2, 9.0)))
    // node 1: weights {1, 4}: (1+2)²/(2·5) = 0.9
    assert(math.abs(Unbalancedness.cos2PhiNode(g, 1) - 0.9) < 1e-12)
  }

  test("avgNodeCos2 is 1 on uniform graphs") {
    val g = GraphGen.uniformComplete(10)
    assert(math.abs(Unbalancedness.avgNodeCos2(g) - 1.0) < 1e-12)
  }

  test("avgNodeCos2 ∈ (0,1] generally") {
    for (seed <- 1 to 5) {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.15, seed), 0.8, seed = seed)
      val a = Unbalancedness.avgNodeCos2(g)
      assert(a > 0 && a <= 1 + 1e-12)
    }
  }

  test("gamma bounds: gamma(a,b) ∈ (0,1], gamma(1,1) = 1, extreme case small") {
    assert(math.abs(Unbalancedness.gamma(1, 1) - 1.0) < 1e-12)
    assert(math.abs(Unbalancedness.gamma(0.5, 0.5) - 1.0) < 1e-12)
    val n = 1000.0
    val g = Unbalancedness.gamma(1 / n, 1 - 1 / n)
    assert(g < 5.0 / n, s"gamma=$g should be O(1/n)")
  }

  test("gamma rejects invalid (a,b)") {
    intercept[IllegalArgumentException](Unbalancedness.gamma(0.8, 0.5))
    intercept[IllegalArgumentException](Unbalancedness.gamma(-0.1, 0.5))
    intercept[IllegalArgumentException](Unbalancedness.gamma(0.5, 1.1))
  }

  test("Lemma 8: sumSqrt per node ≤ (√(ab)+√((1-a)(1-b)))·√(n(v)d(v))") {
    for (seed <- 1 to 6) {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(30, 0.25, seed), 0.7, seed = seed)
      (0 until g.n).foreach { v =>
        if (g.nbrCount(v) > 0) {
          val (a, b) = Unbalancedness.tightestAB(g, v)
          val bound = (math.sqrt(a * b) + math.sqrt((1 - a) * (1 - b))) *
            math.sqrt(g.nbrCount(v).toDouble * g.deg(v))
          assert(g.sumSqrtWeightsPerNode(v) <= bound + 1e-9,
            s"node $v: ${g.sumSqrtWeightsPerNode(v)} > $bound (a=$a b=$b)")
        }
      }
    }
  }

  test("tightestAB: degree-1 node is (1,1)") {
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0)))
    assert(Unbalancedness.tightestAB(g, 0) == ((1.0, 1.0)))
  }

  test("tightestAB on the unbalanced star center: a ≈ 1/n(v), b ≈ 1-1/n") {
    val g = GraphGen.unbalancedStar(100)
    val (a, b) = Unbalancedness.tightestAB(g, 0)
    assert(a <= 2.0 / g.nbrCount(0))
    assert(b >= 0.98)
  }

  test("TheoreticalCost: EdgePush ℓ1 cost ≤ (1-α)·LocalPush ℓ1 cost") {
    for (seed <- 1 to 6) {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.2, seed), 0.9, seed = seed)
      val lp = Unbalancedness.TheoreticalCost.localPushL1(g, 0.2, 1e-3)
      val ep = Unbalancedness.TheoreticalCost.edgePushL1(g, 0.2, 1e-3)
      assert(ep <= lp * 0.8 + 1e-9, s"ep=$ep lp=$lp") // (1-α) = 0.8 guaranteed
    }
  }

  test("TheoreticalCost: EdgePush rmax cost ≤ (1-α)·LocalPush rmax cost") {
    for (seed <- 1 to 6) {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(40, 0.2, seed), 0.9, seed = seed)
      val lp = Unbalancedness.TheoreticalCost.localPushRmax(g, 0.2, 1e-5)
      val ep = Unbalancedness.TheoreticalCost.edgePushRmax(g, 0.2, 1e-5)
      assert(ep <= lp * 0.8 + 1e-9, s"ep=$ep lp=$lp")
    }
  }

  test("improvement factors equal the cost ratios (Lemma 6/7 identities)") {
    val g = GraphGen.withParetoWeights(GraphGen.randomGraph(35, 0.25, 3), 0.8, seed = 3)
    val alpha = 0.2
    val l1Ratio = Unbalancedness.TheoreticalCost.edgePushL1(g, alpha, 1e-3) /
      Unbalancedness.TheoreticalCost.localPushL1(g, alpha, 1e-3)
    assert(math.abs(l1Ratio - Unbalancedness.TheoreticalCost.improvementL1(g, alpha)) < 1e-9)
    val rmRatio = Unbalancedness.TheoreticalCost.edgePushRmax(g, alpha, 1e-5) /
      Unbalancedness.TheoreticalCost.localPushRmax(g, alpha, 1e-5)
    assert(math.abs(rmRatio - Unbalancedness.TheoreticalCost.improvementRmax(g, alpha)) < 1e-9)
  }

  test("Lemma 9: theoretical EdgePush cost ≤ gamma · LocalPush cost when all nodes (a,b)-unbalanced") {
    val g = GraphGen.unbalancedComplete(40)
    // weakest (a,b) over nodes: take per-node tightest, combine by max gamma
    val gammas = (0 until g.n).map { v =>
      val (a, b) = Unbalancedness.tightestAB(g, v)
      Unbalancedness.gamma(a, b)
    }
    val gammaMax = gammas.max
    val alpha = 0.2
    val lp = Unbalancedness.TheoreticalCost.localPushL1(g, alpha, 1e-3)
    val ep = Unbalancedness.TheoreticalCost.edgePushL1(g, alpha, 1e-3)
    assert(ep <= gammaMax * lp + 1e-6, s"ep=$ep gamma*lp=${gammaMax * lp}")
  }

  test("mean and max weight") {
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 2.0), (1, 2, 6.0)))
    assert(math.abs(Unbalancedness.meanWeight(g) - 4.0) < 1e-12)
    assert(Unbalancedness.maxWeight(g) == 6.0)
  }
}
