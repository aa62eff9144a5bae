package repro.metrics

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.WeightedGraph

class ErrorsSpec extends AnyFunSuite {

  test("l1 of identical vectors is 0") {
    assert(Errors.l1(Array(0.1, 0.2), Array(0.1, 0.2)) == 0.0)
  }

  test("l1 sums absolute differences") {
    assert(math.abs(Errors.l1(Array(0.1, 0.5), Array(0.2, 0.2)) - 0.4) < 1e-12)
  }

  test("l1 rejects length mismatch") {
    intercept[IllegalArgumentException](Errors.l1(Array(1.0), Array(1.0, 2.0)))
  }

  test("maxAddErr picks the largest deviation") {
    assert(math.abs(Errors.maxAddErr(Array(0.1, 0.5, 0.3), Array(0.2, 0.2, 0.3)) - 0.3) < 1e-12)
  }

  test("normMaxAddErr divides by degree and skips zero-degree nodes") {
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 4.0)))
    // node 2 is isolated: a huge diff there must be ignored
    val err = Errors.normMaxAddErr(g, Array(0.4, 0.0, 9.0), Array(0.0, 0.0, 0.0))
    assert(math.abs(err - 0.1) < 1e-12) // 0.4 / d(0)=4
  }

  test("precisionAtK: perfect ranking") {
    val truth = Array(0.5, 0.3, 0.1, 0.05, 0.0)
    assert(Errors.precisionAtK(truth, truth, 3) == 1.0)
  }

  test("precisionAtK: disjoint top sets") {
    val truth = Array(1.0, 0.9, 0.0, 0.0)
    val est = Array(0.0, 0.0, 1.0, 0.9)
    assert(Errors.precisionAtK(est, truth, 2) == 0.0)
  }

  test("precisionAtK: partial overlap") {
    val truth = Array(1.0, 0.9, 0.8, 0.0)
    val est = Array(1.0, 0.0, 0.8, 0.9)
    // top-3 truth {0,1,2}; top-3 est {0,3,2} → overlap 2/3
    assert(math.abs(Errors.precisionAtK(est, truth, 3) - 2.0 / 3) < 1e-12)
  }

  test("precisionAtK: truth with fewer than k positive entries") {
    val truth = Array(1.0, 0.0, 0.0)
    val est = Array(1.0, 0.5, 0.0)
    assert(Errors.precisionAtK(est, truth, 50) == 1.0)
  }

  test("precisionAtK on all-zero truth is vacuously 1") {
    assert(Errors.precisionAtK(Array(0.1, 0.2), Array(0.0, 0.0), 5) == 1.0)
  }

  test("normPrecisionAtK ranks by pi/d") {
    val g = WeightedGraph.fromUndirectedEdges(3, Seq((0, 1, 1.0), (1, 2, 9.0)))
    // d = (1, 10, 9). truth: node0=0.1, node1=0.5, node2=0.4
    // normalized: (0.1, 0.05, 0.0444) → top-1 is node 0, not node 1.
    val truth = Array(0.1, 0.5, 0.4)
    val estGood = Array(0.2, 0.0, 0.0) // top-1 normalized also node 0
    val estBad = Array(0.0, 0.9, 0.0)
    assert(Errors.normPrecisionAtK(g, estGood, truth, 1) == 1.0)
    assert(Errors.normPrecisionAtK(g, estBad, truth, 1) == 0.0)
  }

  test("topK excludes non-positive values and orders desc") {
    assert(Errors.topK(Array(0.0, 0.3, -0.1, 0.5), 10) == Seq(3, 1))
  }

  test("topK tie-break by id") {
    assert(Errors.topK(Array(0.5, 0.5, 0.5), 2) == Seq(0, 1))
  }
}
