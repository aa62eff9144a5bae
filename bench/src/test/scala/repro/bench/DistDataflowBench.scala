package repro.bench

import repro.SparkSpec
import repro.core.dist.{EdgePushDF, GraphFrames, LocalPushDF}
import repro.graphgen.GraphGen
import repro.harness.Harness
import repro.jobs.DistDataflowJob
import repro.motif.MotifWeights

/** Distributed-dataflow comparison on Spark: EdgePushDF vs LocalPushDF
  * edge touches and supersteps on a motif-weighted power-law graph — the
  * repro target (edge-level push as DataFrame message passing).
  */
class DistDataflowBench extends SparkSpec {

  test("dist dataflow table: EdgePushDF vs LocalPushDF") {
    val out = DistDataflowJob.run(spark, n = 1200, rmax = 1e-5)
    println("\n== distributed dataflow (Spark DataFrames) ==")
    println(out)
    assert(out.nonEmpty)
  }

  test("shape: EdgePushDF processes fewer edges than LocalPushDF on an unbalanced graph") {
    val g = GraphGen.withParetoWeights(
      GraphGen.chungLu(1200, avgDeg = 10, beta = 2.2, seed = 7), alpha = 0.7, seed = 9)
    val s = g.sampleSourcesByDegree(1, seed = 7)(0).toLong
    val rmax = 1e-5
    val edges = g.toEdgeDF(spark).cache()
    val lp = LocalPushDF.compute(spark, edges, s, Harness.DefaultAlpha, rmax)
    val ep = EdgePushDF.compute(spark,
      GraphFrames.withRmaxTheta(edges, rmax), s, Harness.DefaultAlpha)
    println(s"LocalPushDF: steps=${lp.supersteps} touches=${lp.edgeTouches}")
    println(s"EdgePushDF:  steps=${ep.supersteps} touches=${ep.edgeTouches}")
    assert(ep.edgeTouches < lp.edgeTouches,
      s"EdgePushDF ${ep.edgeTouches} should beat LocalPushDF ${lp.edgeTouches}")
  }
}
