package repro.metrics

import repro.graph.WeightedGraph

/** Approximation-quality metrics of §6: ℓ1-error, MaxAddErr, their
  * degree-normalized variants, and (normalized) precision@k.
  */
object Errors {

  /** ℓ1-error ‖π̂ − π‖₁. */
  def l1(est: Array[Double], truth: Array[Double]): Double = {
    require(est.length == truth.length)
    var s = 0.0
    var i = 0
    while (i < est.length) { s += math.abs(est(i) - truth(i)); i += 1 }
    s
  }

  /** MaxAddErr = max_u |π̂(u) − π(u)|. */
  def maxAddErr(est: Array[Double], truth: Array[Double]): Double = {
    require(est.length == truth.length)
    var m = 0.0
    var i = 0
    while (i < est.length) { m = math.max(m, math.abs(est(i) - truth(i))); i += 1 }
    m
  }

  /** normalized MaxAddErr = max_u |π̂(u)/d(u) − π(u)/d(u)| over nodes with
    * d(u) > 0.
    */
  def normMaxAddErr(g: WeightedGraph, est: Array[Double], truth: Array[Double]): Double = {
    var m = 0.0
    var u = 0
    while (u < g.n) {
      if (g.deg(u) > 0) m = math.max(m, math.abs(est(u) - truth(u)) / g.deg(u))
      u += 1
    }
    m
  }

  /** precision@k: |topK(est) ∩ topK(truth)| / k. Ties broken by node id
    * (deterministic); nodes with zero truth value are excluded from the
    * truth top-k when fewer than k nodes have positive values.
    */
  def precisionAtK(est: Array[Double], truth: Array[Double], k: Int): Double = {
    val topTruth = topK(truth, k)
    if (topTruth.isEmpty) return 1.0
    val topEst = topK(est, topTruth.size).toSet
    topTruth.count(topEst.contains).toDouble / topTruth.size
  }

  /** normalized precision@k on the D⁻¹π ranking (§6.1). */
  def normPrecisionAtK(g: WeightedGraph, est: Array[Double], truth: Array[Double], k: Int): Double = {
    def norm(x: Array[Double]) =
      Array.tabulate(x.length)(u => if (g.deg(u) > 0) x(u) / g.deg(u) else 0.0)
    precisionAtK(norm(est), norm(truth), k)
  }

  /** Indices of the k largest strictly-positive entries (value desc, id asc). */
  def topK(x: Array[Double], k: Int): Seq[Int] =
    x.zipWithIndex.filter(_._1 > 0).sortBy { case (v, i) => (-v, i) }.take(k).map(_._2).toSeq
}
