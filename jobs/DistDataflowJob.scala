package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.dist.{EdgePushDF, GraphFrames, LocalPushDF}
import repro.graphgen.GraphGen
import repro.harness.Harness
import repro.motif.MotifWeights

/** spark-submit entrypoint for the distributed-dataflow comparison:
  * EdgePushDF vs LocalPushDF edge touches per superstep on a motif-weighted
  * power-law graph — the repro target of this paper on Spark.
  *
  * Usage: spark-submit --class repro.jobs.DistDataflowJob repro.jar [n]
  */
object DistDataflowJob {

  def run(spark: SparkSession, n: Int, rmax: Double = 1e-5): String = {
    val g = MotifWeights.motifWeightedGraph(
      GraphGen.chungLu(n, avgDeg = 12, beta = 2.3, seed = 7))
    val s = g.sampleSourcesByDegree(1, seed = 7)(0).toLong
    val edges = g.toEdgeDF(spark).cache()
    val lp = LocalPushDF.compute(spark, edges, s, Harness.DefaultAlpha, rmax)
    val ep = EdgePushDF.compute(spark,
      GraphFrames.withRmaxTheta(edges, rmax), s, Harness.DefaultAlpha)
    Harness.formatTable(
      Seq("method", "supersteps", "edgeTouches", "perStep(first 10)"),
      Seq(
        Seq("LocalPushDF", lp.supersteps.toString, lp.edgeTouches.toString,
          lp.perStepWork.take(10).mkString(",")),
        Seq("EdgePushDF", ep.supersteps.toString, ep.edgeTouches.toString,
          ep.perStepWork.take(10).mkString(",")),
      ))
  }

  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(2000)
    val spark = SparkSession.builder.appName("DistDataflowJob")
      .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate()
    println("== Distributed dataflow: EdgePushDF vs LocalPushDF ==")
    println(run(spark, n))
    spark.stop()
  }
}
