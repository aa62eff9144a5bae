package repro.core.dist

import repro.SparkSpec
import repro.TestUtil
import repro.core.{EdgePushSeq, LocalPushSeq, PowerMethodSeq, Thresholds}
import repro.graphgen.GraphGen
import repro.metrics.Errors

/** Cross-implementation equivalence: the distributed DataFrame algorithms
  * and their sequential references must agree on the same graphs within
  * the analytical error budgets.
  */
class DistEquivalenceSpec extends SparkSpec {

  private val alpha = 0.2

  for (seed <- 1 to 3)
    test(s"PowerMethodDF == PowerMethodSeq exactly (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(20, 0.25, seed), 1.0, seed = seed)
      val df = PowerMethodDF.compute(spark, g.toEdgeDF(spark), 0L, alpha, 12)
      val got = GraphFrames.toDense(df.pi.withColumnRenamed("pi", "value"), g.n)
      val want = PowerMethodSeq.compute(g, 0, alpha, 12).pi
      assert(TestUtil.l1Diff(got, want) < 1e-9)
    }

  for (seed <- 1 to 3)
    test(s"LocalPushDF and LocalPushSeq both satisfy Fact 2 (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.2, seed), 0.9, seed = seed)
      val rmax = 1e-3
      val exact = TestUtil.exactPpr(g, 0, alpha)
      val seqPi = LocalPushSeq.compute(g, 0, alpha, rmax).pi
      val dfPi = GraphFrames.toDense(
        LocalPushDF.compute(spark, g.toEdgeDF(spark), 0L, alpha, rmax)
          .pi.withColumnRenamed("pi", "value"), g.n)
      Seq(seqPi, dfPi).foreach { pi =>
        (0 until g.n).foreach { u =>
          if (g.deg(u) > 0)
            assert(math.abs(pi(u) - exact(u)) / g.deg(u) <= rmax + 1e-12)
        }
      }
    }

  for (seed <- 1 to 3)
    test(s"EdgePushDF and EdgePushSeq both satisfy Theorem 2 (seed=$seed)") {
      val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.2, seed), 0.9, seed = seed)
      val eps = 1e-2
      val exact = TestUtil.exactPpr(g, 0, alpha)
      val seqPi = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, eps)).pi
      val dfPi = GraphFrames.toDense(
        EdgePushDF.compute(spark, GraphFrames.withL1Theta(g.toEdgeDF(spark), eps), 0L, alpha)
          .pi.withColumnRenamed("pi", "value"), g.n)
      assert(Errors.l1(seqPi, exact) <= eps + 1e-9)
      assert(Errors.l1(dfPi, exact) <= eps + 1e-9)
    }

  test("distributed work ordering matches sequential ordering on an unbalanced graph") {
    val g = GraphGen.unbalancedStar(120)
    val eps = 0.02
    val seqLp = LocalPushSeq.compute(g, 0, alpha, Thresholds.localPushL1Theta(g, eps))
    val seqEp = EdgePushSeq.compute(g, 0, alpha, Thresholds.l1(g, eps))
    val edges = g.toEdgeDF(spark)
    val dfLp = LocalPushDF.compute(spark, edges, 0L, alpha, Thresholds.localPushL1Theta(g, eps))
    val dfEp = EdgePushDF.compute(spark, GraphFrames.withL1Theta(edges, eps), 0L, alpha)
    // EdgePush beats LocalPush in both execution models
    assert(seqEp.totalWork < seqLp.totalWork)
    assert(dfEp.edgeTouches < dfLp.edgeTouches)
  }
}
