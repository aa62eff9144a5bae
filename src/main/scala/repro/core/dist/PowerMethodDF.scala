package repro.core.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.dist.GraphFrames.MaterializeOps

/** Power Method as a DataFrame iteration: one superstep is
  * π' = (1−α)·P·π + α·e_s, expressed as edges ⋈ π → groupBy(dst) → sum.
  * Touches all 2m directed edges every iteration — the Θ(m)-per-iteration
  * cost the local-push family avoids.
  */
object PowerMethodDF {

  def compute(spark: SparkSession, edges: DataFrame, s: Long, alpha: Double,
              iters: Int): DistPprResult = {
    val degrees = GraphFrames.materialize(GraphFrames.degreesDF(edges))
    val twoM = edges.count()
    val e = edges.join(degrees.withColumnRenamed("node", "src2"),
        col("src") === col("src2"))
      .select(col("src"), col("dst"), (col("weight") / col("deg")).as("p"))
      .materialized

    var pi = GraphFrames.unitVectorDF(spark, degrees, s)
      .withColumnRenamed("value", "pi")
    var it = 0
    while (it < iters) {
      val msgs = e.join(pi, e("src") === pi("node"))
        .select(col("dst").as("node"), (lit(1 - alpha) * col("p") * col("pi")).as("m"))
        .groupBy("node")
        .agg(sum("m").as("m"))
      pi = degrees.select(col("node"))
        .join(msgs, Seq("node"), "left")
        .select(col("node"),
          (coalesce(col("m"), lit(0.0)) +
            when(col("node") === s, alpha).otherwise(0.0)).as("pi"))
        .materialized
      it += 1
    }
    DistPprResult(pi, iters, twoM * iters, Seq.fill(iters)(twoM))
  }
}
