package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{EdgePushSeq, LocalPushSeq, Thresholds}
import repro.graphgen.Affinity
import repro.harness.Harness
import repro.jobs.UnbalancednessJob
import repro.metrics.Unbalancedness

/** Reproduces §6.3 (Figures 16/17 as a table): the four Gaussian-kernel
  * affinity graphs with decreasing unbalancedness; the EdgePush advantage
  * must shrink left to right.
  *
  * Paper values at n = 10⁵: cos²φ = (0.01, 0.14, 0.38, 0.66) and
  * (Σ n_v cos²φ_v)/m = (0.01, 0.14, 0.41, 0.77); the gap between the
  * EdgePush and LocalPush trade-off curves closes as the weights balance.
  */
class UnbalancednessBench extends AnyFunSuite {

  private val n = 700

  test("§6.3 affinity-graph table (Figures 16/17)") {
    val out = UnbalancednessJob.run(n, eps = 1e-2, rmax = 1e-3, nSources = 3)
    println("\n== §6.3: unbalancedness sensitivity ==")
    println(out)
    assert(out.nonEmpty)
  }

  test("shape: cos2phi increases across the four configs") {
    val cos = Affinity.paperConfigs.zipWithIndex.map { case (cfg, i) =>
      Unbalancedness.cos2Phi(Affinity.graph(n, cfg, seed = 17 + i))
    }
    assert(cos(0) < cos(2) && cos(2) < cos(3), s"cos sequence $cos")
  }

  test("shape: EdgePush/LocalPush work ratio grows toward 1 as graphs balance") {
    val ratios = Affinity.paperConfigs.zipWithIndex.map { case (cfg, i) =>
      val g = Affinity.graph(n, cfg, seed = 17 + i)
      val s = g.sampleSourcesByDegree(1, seed = 7)(0)
      val rmax = 1e-3
      val lp = LocalPushSeq.compute(g, s, Harness.DefaultAlpha, rmax)
      val ep = EdgePushSeq.compute(g, s, Harness.DefaultAlpha, Thresholds.rmax(g, rmax))
      ep.totalWork.toDouble / math.max(lp.totalWork, 1L)
    }
    println(s"work ratios across configs: ${ratios.mkString(", ")}")
    assert(ratios(0) < ratios(3),
      s"most unbalanced config must show the biggest advantage: $ratios")
    assert(ratios(0) < 0.5, s"config 1 ratio ${ratios(0)} should be well below 1")
  }
}
