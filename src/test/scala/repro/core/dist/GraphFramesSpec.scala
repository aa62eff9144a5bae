package repro.core.dist

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.Thresholds
import repro.graphgen.GraphGen

class GraphFramesSpec extends SparkSpec {

  private lazy val g = GraphGen.withParetoWeights(GraphGen.randomGraph(25, 0.2, 1), 0.9, seed = 1)
  private lazy val edges = g.toEdgeDF(spark).cache()

  test("degreesDF matches the CSR degrees") {
    val degs = GraphFrames.toDense(
      GraphFrames.degreesDF(edges).withColumnRenamed("deg", "value"), g.n)
    (0 until g.n).foreach(u => assert(math.abs(degs(u) - g.deg(u)) < 1e-9, s"node $u"))
  }

  test("degreesDF neighborhood sizes match CSR") {
    val nbrs = GraphFrames.toDense(
      GraphFrames.degreesDF(edges).withColumn("value", col("nbrs").cast("double")), g.n)
    (0 until g.n).foreach(u =>
      if (g.nbrCount(u) > 0) assert(nbrs(u) == g.nbrCount(u).toDouble))
  }

  test("withL1Theta matches Thresholds.l1 per edge") {
    val eps = 1e-3
    val want = Thresholds.l1(g, eps)
    val got = GraphFrames.withL1Theta(edges, eps).collect()
      .map(r => ((r.getAs[Long]("src").toInt, r.getAs[Long]("dst").toInt),
        r.getAs[Double]("theta"))).toMap
    var u = 0
    while (u < g.n) {
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) {
        assert(math.abs(got((u, g.nbr(e))) - want(e)) < 1e-12)
        e += 1
      }
      u += 1
    }
  }

  test("withRmaxTheta matches Thresholds.rmax per edge") {
    val rm = 1e-4
    val want = Thresholds.rmax(g, rm)
    val got = GraphFrames.withRmaxTheta(edges, rm).collect()
      .map(r => ((r.getAs[Long]("src").toInt, r.getAs[Long]("dst").toInt),
        r.getAs[Double]("theta"))).toMap
    var u = 0
    while (u < g.n) {
      var e = g.indptr(u)
      while (e < g.indptr(u + 1)) {
        assert(math.abs(got((u, g.nbr(e))) - want(e)) < 1e-10)
        e += 1
      }
      u += 1
    }
  }

  test("unitVectorDF puts mass 1 on the source only") {
    val degrees = GraphFrames.degreesDF(edges)
    val v = GraphFrames.toDense(GraphFrames.unitVectorDF(spark, degrees, 3L), g.n)
    assert(v(3) == 1.0)
    assert(v.sum == 1.0)
  }

  test("oracle: per-destination sqrt-weight aggregate (Theorem 3 denominator)") {
    val sparkAgg = edges.groupBy(col("dst").as("node"))
      .agg(sum(sqrt(col("weight"))).as("sumsqrt"))
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT dst AS node, sum(sqrt(CAST(weight AS DOUBLE))) AS sumsqrt " +
        "FROM edges GROUP BY dst",
      "edges" -> edges)
  }

  test("oracle: candidate-edge selection of the first EdgePush superstep") {
    // At step 0, q = e_s, so an edge is a candidate iff src = s and
    // (1-α)·w/d(s) ≥ θ. Check the relational selection against DuckDB.
    val alpha = 0.2
    val s = g.sampleSourcesByDegree(1, 5)(0)
    val te = GraphFrames.withRmaxTheta(edges, 1e-3)
    val degrees = GraphFrames.degreesDF(edges)
    val withQ = te.join(degrees.select(col("node"), col("deg")), te("src") === col("node"))
      .withColumn("q", when(col("src") === s, 1.0).otherwise(0.0))
      .withColumn("residue", lit(1 - alpha) * col("q") * col("weight") / col("deg"))
    val cand = withQ.filter(col("residue") >= col("theta"))
      .select(col("src"), col("dst"))
    Oracle.assertEquivalent(
      cand,
      s"""
        |WITH d AS (SELECT src AS node, sum(CAST(weight AS DOUBLE)) AS deg
        |           FROM tedges GROUP BY src)
        |SELECT t.src, t.dst
        |FROM tedges t JOIN d ON CAST(t.src AS BIGINT) = CAST(d.node AS BIGINT)
        |WHERE 0.8 * (CASE WHEN CAST(t.src AS BIGINT) = $s THEN 1.0 ELSE 0.0 END)
        |        * CAST(t.weight AS DOUBLE) / d.deg
        |      >= CAST(t.theta AS DOUBLE)
        |""".stripMargin,
      "tedges" -> te)
  }
}
