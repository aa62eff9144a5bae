package repro.graphgen

import org.scalatest.funsuite.AnyFunSuite
import repro.metrics.Unbalancedness
import repro.motif.MotifWeights

class PlantedCliqueSpec extends AnyFunSuite {

  test("planted cliques add the expected clique edges") {
    val base = GraphGen.chungLu(300, 4, 2.5, seed = 1)
    val g = GraphGen.withPlantedCliques(base, numCliques = 2, cliqueSize = 10, seed = 2)
    assert(g.m > base.m)
    assert(g.n == base.n)
  }

  test("planted cliques never duplicate existing edges") {
    val base = GraphGen.chungLu(200, 6, 2.5, seed = 3)
    val g = GraphGen.withPlantedCliques(base, 3, 15, seed = 4)
    val pairs = GraphGen.undirectedEdges(g).map { case (u, v, _) => (u, v) }
    assert(pairs.distinct.size == pairs.size)
  }

  test("motif weights on a clique overlay are unbalanced") {
    val base = GraphGen.chungLu(800, 6, 2.5, seed = 5)
    val withCliques = GraphGen.withPlantedCliques(base, 6, 30, seed = 6)
    val mg = MotifWeights.motifWeightedGraph(withCliques)
    val mgPlain = MotifWeights.motifWeightedGraph(base)
    // clique edges carry weight ~cliqueSize-2 while background edges ~1,
    // so cos²φ drops versus the plain motif graph
    if (mgPlain.m > 0 && mg.m > 0)
      assert(Unbalancedness.cos2Phi(mg) < Unbalancedness.cos2Phi(mgPlain) + 0.05,
        s"cliques ${Unbalancedness.cos2Phi(mg)} vs plain ${Unbalancedness.cos2Phi(mgPlain)}")
    assert(Unbalancedness.maxWeight(mg) >= 20, "in-clique motif weight should be ~cliqueSize")
  }

  test("IC stand-in is a dense motif graph with heavy hub weights") {
    val ic = Datasets.byKey("IC").build(1500)
    val yt = Datasets.byKey("YT").build(1500)
    assert(Unbalancedness.maxWeight(ic) > Unbalancedness.maxWeight(yt),
      s"IC max ${Unbalancedness.maxWeight(ic)} vs YT max ${Unbalancedness.maxWeight(yt)}")
    assert(ic.m > yt.m)
  }

  test("deterministic in seed") {
    val base = GraphGen.chungLu(200, 5, 2.5, seed = 7)
    val a = GraphGen.withPlantedCliques(base, 2, 12, seed = 8)
    val b = GraphGen.withPlantedCliques(base, 2, 12, seed = 8)
    assert(a.m == b.m && a.wgt.toSeq == b.wgt.toSeq)
  }
}
