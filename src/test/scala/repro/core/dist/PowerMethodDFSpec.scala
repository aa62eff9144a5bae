package repro.core.dist

import repro.SparkSpec
import repro.TestUtil
import repro.core.PowerMethodSeq
import repro.graphgen.GraphGen

class PowerMethodDFSpec extends SparkSpec {

  private lazy val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.2, 2), 0.9, seed = 2)

  test("matches the sequential Power Method after the same iterations") {
    val edges = g.toEdgeDF(spark)
    val iters = 15
    val dist = PowerMethodDF.compute(spark, edges, 0L, 0.2, iters)
    val got = GraphFrames.toDense(dist.pi.withColumnRenamed("pi", "value"), g.n)
    val want = PowerMethodSeq.compute(g, 0, 0.2, iters).pi
    assert(TestUtil.l1Diff(got, want) < 1e-9)
  }

  test("converges toward the exact PPR") {
    val edges = g.toEdgeDF(spark)
    val dist = PowerMethodDF.compute(spark, edges, 1L, 0.2, 30)
    val got = GraphFrames.toDense(dist.pi.withColumnRenamed("pi", "value"), g.n)
    val exact = TestUtil.exactPpr(g, 1, 0.2)
    assert(TestUtil.l1Diff(got, exact) < math.pow(0.8, 30) + 1e-9)
  }

  test("work accounting: 2m per iteration") {
    val edges = g.toEdgeDF(spark)
    val dist = PowerMethodDF.compute(spark, edges, 0L, 0.2, 3)
    assert(dist.edgeTouches == 3L * g.directedEdgeCount)
    assert(dist.perStepWork == Seq.fill(3)(g.directedEdgeCount.toLong))
  }

  test("mass conservation in the DataFrame iterate") {
    val edges = g.toEdgeDF(spark)
    val dist = PowerMethodDF.compute(spark, edges, 0L, 0.2, 10)
    val sum = GraphFrames.toDense(dist.pi.withColumnRenamed("pi", "value"), g.n).sum
    assert(math.abs(sum - 1.0) < 1e-9, s"sum=$sum")
  }
}
