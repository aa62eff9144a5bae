package repro.core.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.dist.GraphFrames.MaterializeOps

/** LocalPush as bulk-synchronous DataFrame dataflow.
  *
  * One superstep pushes *every* active node (r(u) ≥ d(u)·θ) at once:
  * reserves gain α·r(u), and each active node's entire residue is joined
  * against ALL of its edges — the node-granular cost Σ_{active u} n(u)
  * that EdgePushDF undercuts on unbalanced graphs. Termination (no active
  * node) implies exactly Algorithm 1's guarantee: every residue is below
  * d(u)·θ, so Fact 1/Fact 2 error bounds carry over verbatim.
  */
object LocalPushDF {

  def compute(spark: SparkSession, edges: DataFrame, s: Long, alpha: Double,
              theta: Double, maxSupersteps: Int = 500): DistPprResult = {
    val degrees = GraphFrames.materialize(GraphFrames.degreesDF(edges))
    val e = edges.select(col("src"), col("dst"), col("weight")).materialized

    // state: (node, deg, nbrs, r, p)
    var state = degrees
      .withColumn("r", when(col("node") === s, 1.0).otherwise(0.0))
      .withColumn("p", lit(0.0))
      .materialized

    var steps = 0
    var work = List.empty[Long]
    var done = false
    while (!done && steps < maxSupersteps) {
      val active = state.filter(col("r") >= col("deg") * theta && col("deg") > 0)
      val stats = active.agg(
        count(lit(1)).as("cnt"), sum("nbrs").as("touches")).head()
      val activeCnt = stats.getLong(0)
      if (activeCnt == 0) done = true
      else {
        work = stats.getLong(1) :: work
        val msgs = active
          .join(e, col("node") === e("src"))
          .select(e("dst").as("node2"),
            (lit(1 - alpha) * col("r") * col("weight") / col("deg")).as("m"))
          .groupBy("node2")
          .agg(sum("m").as("m"))
        state = state
          .join(msgs, state("node") === col("node2"), "left")
          .select(col("node"), col("deg"), col("nbrs"),
            // active nodes push their whole residue and receive messages
            (when(col("r") >= col("deg") * theta && col("deg") > 0, 0.0)
              .otherwise(col("r")) + coalesce(col("m"), lit(0.0))).as("r"),
            (col("p") + when(col("r") >= col("deg") * theta && col("deg") > 0,
              lit(alpha) * col("r")).otherwise(0.0)).as("p"))
          .materialized
        steps += 1
      }
    }
    val pi = state.select(col("node"), col("p").as("pi"))
    val perStep = work.reverse
    DistPprResult(pi, steps, perStep.sum, perStep)
  }
}
