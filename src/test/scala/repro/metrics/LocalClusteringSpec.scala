package repro.metrics

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{EdgePushSeq, LocalPushSeq, Thresholds}
import repro.graph.WeightedGraph
import scala.util.Random

/** End-to-end local clustering (§2 sweep + §6.1 application): on a planted
  * two-community graph, the approximate SSPPR vector fed through the sweep
  * must recover the seed's community with low conductance.
  */
class LocalClusteringSpec extends AnyFunSuite {

  /** Two communities of size k, dense inside (p=0.5), sparse across
    * (few bridges), unit-ish weights.
    */
  private def planted(k: Int, seed: Long): WeightedGraph = {
    val rnd = new Random(seed)
    val edges = Seq.newBuilder[(Int, Int, Double)]
    def community(offset: Int): Unit = {
      // spanning cycle for connectivity + random internal edges
      (0 until k).foreach(i =>
        edges += ((offset + i, offset + (i + 1) % k + (if ((i + 1) % k == 0) 0 else 0), 1.0 + rnd.nextDouble())))
      for (i <- 0 until k; j <- i + 2 until k)
        if (rnd.nextDouble() < 0.3) edges += ((offset + i, offset + j, 1.0 + rnd.nextDouble()))
    }
    community(0); community(k)
    // three weak bridges
    (0 until 3).foreach(i => edges += ((i, k + i, 0.1)))
    val dedup = edges.result().groupBy { case (u, v, _) => (math.min(u, v), math.max(u, v)) }
      .map { case ((u, v), ws) => (u, v, ws.head._3) }.toSeq
      .filter { case (u, v, _) => u != v }
    WeightedGraph.fromUndirectedEdges(2 * k, dedup)
  }

  private val alpha = 0.2

  for (seed <- 1 to 3)
    test(s"EdgePush + sweep recovers the seed community (seed=$seed)") {
      val k = 30
      val g = planted(k, seed)
      val pi = EdgePushSeq.compute(g, 0, alpha, Thresholds.rmax(g, 1e-6)).pi
      val (phi, sz) = Conductance.sweep(g, pi)
      // the planted cut has conductance ≈ 0.3/vol(community) — tiny
      assert(phi < 0.05, s"conductance $phi")
      assert(sz >= k - 5 && sz <= k + 5, s"cluster size $sz (want ~$k)")
      // the recovered prefix is inside the seed community
      val order = (0 until g.n).filter(u => pi(u) > 0 && g.deg(u) > 0)
        .sortBy(u => (-pi(u) / g.deg(u), u))
      assert(order.take(sz).count(_ < k) >= sz - 2)
    }

  test("MAPPR (LocalPush) + sweep finds the same cluster") {
    val k = 30
    val g = planted(k, 7)
    val pi = LocalPushSeq.compute(g, 0, alpha, 1e-6).pi
    val (phi, sz) = Conductance.sweep(g, pi)
    assert(phi < 0.05, s"conductance $phi")
    assert(sz >= k - 5 && sz <= k + 5)
  }

  test("coarse approximations give worse (or equal) conductance than fine ones") {
    val g = planted(40, 9)
    val coarse = Conductance.sweep(g, EdgePushSeq.compute(g, 0, alpha,
      Thresholds.rmax(g, 1e-2)).pi)._1
    val fine = Conductance.sweep(g, EdgePushSeq.compute(g, 0, alpha,
      Thresholds.rmax(g, 1e-7)).pi)._1
    assert(fine <= coarse + 1e-9, s"fine=$fine coarse=$coarse")
  }

  test("a seed in the second community recovers that community") {
    val k = 30
    val g = planted(k, 11)
    val pi = EdgePushSeq.compute(g, k + 5, alpha, Thresholds.rmax(g, 1e-6)).pi
    val (phi, sz) = Conductance.sweep(g, pi)
    assert(phi < 0.05)
    val order = (0 until g.n).filter(u => pi(u) > 0 && g.deg(u) > 0)
      .sortBy(u => (-pi(u) / g.deg(u), u))
    assert(order.take(sz).count(_ >= k) >= sz - 2)
  }
}
