package repro.harness

import repro.core._
import repro.graph.WeightedGraph
import repro.metrics.{Conductance, Errors, Unbalancedness}

/** Shared experiment harness: runs the §6 sweeps and produces the rows the
  * paper's tables/figures report. Used by the `bench/` suites and the
  * `jobs/` spark-submit mains so both print identical tables.
  */
object Harness {

  val DefaultAlpha = 0.2 // the paper's teleport probability in all experiments

  /** One (dataset, method, parameter) measurement, averaged over sources. */
  final case class SweepRow(
      dataset: String,
      method: String,
      param: Double,
      work: Double, // edge touches + walk steps (hardware-independent cost)
      millis: Double,
      l1: Double,
      maxAddErr: Double,
      normMaxAddErr: Double,
      precision50: Double,
      normPrecision50: Double,
      conductance: Double,
  )

  /** Evaluate one estimate against ground truth on every §6 metric. */
  def evaluate(g: WeightedGraph, est: Array[Double], truth: Array[Double]):
      (Double, Double, Double, Double, Double, Double) = {
    val l1 = Errors.l1(est, truth)
    val mae = Errors.maxAddErr(est, truth)
    val nmae = Errors.normMaxAddErr(g, est, truth)
    val p50 = Errors.precisionAtK(est, truth, 50)
    val np50 = Errors.normPrecisionAtK(g, est, truth, 50)
    val cond = Conductance.sweep(g, est)._1
    (l1, mae, nmae, p50, np50, cond)
  }

  private def averaged(dataset: String, method: String, param: Double,
                       g: WeightedGraph, sources: Array[Int],
                       truths: Map[Int, Array[Double]],
                       run: Int => PprResult): SweepRow = {
    var work, millis, l1, mae, nmae, p50, np50, cond = 0.0
    sources.foreach { s =>
      val res = run(s)
      val (a, b, c, d, e, f) = evaluate(g, res.pi, truths(s))
      work += res.totalWork.toDouble; millis += res.wallMillis
      l1 += a; mae += b; nmae += c; p50 += d; np50 += e; cond += f
    }
    val k = sources.length.toDouble
    SweepRow(dataset, method, param, work / k, millis / k, l1 / k, mae / k,
      nmae / k, p50 / k, np50 / k, cond / k)
  }

  /** Ground truths (Power Method, 100 iterations) for a query set. */
  def groundTruths(g: WeightedGraph, sources: Array[Int],
                   alpha: Double): Map[Int, Array[Double]] =
    sources.distinct.map(s => s -> PowerMethodSeq.groundTruth(g, s, alpha)).toMap

  /** §6.1 sweep: EdgePush-Add vs MAPPR vs MC vs FORA vs SpeedPPR.
    * `rmaxValues` drives EdgePush/MAPPR; `deltas` drives the sampling
    * methods (ε_r = 0.5, p_f = 1/n fixed, as in the paper).
    */
  def addErrSweep(dataset: String, g: WeightedGraph, sources: Array[Int],
                  rmaxValues: Seq[Double], deltas: Seq[Double],
                  alpha: Double = DefaultAlpha): Seq[SweepRow] = {
    val truths = groundTruths(g, sources, alpha)
    val pf = 1.0 / g.n
    val edgeRows = rmaxValues.map { rm =>
      val theta = Thresholds.rmax(g, rm)
      averaged(dataset, "EdgePush-Add", rm, g, sources, truths,
        s => EdgePushSeq.compute(g, s, alpha, theta))
    }
    val mapprRows = rmaxValues.map { rm =>
      averaged(dataset, "MAPPR", rm, g, sources, truths,
        s => LocalPushSeq.compute(g, s, alpha, rm))
    }
    val mcRows = deltas.map { d =>
      val w = MonteCarloSeq.walkCount(d, 0.5, pf)
      averaged(dataset, "MC", d, g, sources, truths,
        s => MonteCarloSeq.compute(g, s, alpha, w, seed = 42 + s))
    }
    val foraRows = deltas.map { d =>
      averaged(dataset, "FORA", d, g, sources, truths,
        s => ForaSeq.compute(g, s, alpha, d, 0.5, pf, seed = 42 + s))
    }
    val speedRows = deltas.map { d =>
      averaged(dataset, "SpeedPPR", d, g, sources, truths,
        s => SpeedPprSeq.compute(g, s, alpha, d, 0.5, pf, seed = 42 + s))
    }
    edgeRows ++ mapprRows ++ mcRows ++ foraRows ++ speedRows
  }

  /** §6.2 sweep: EdgePush-ℓ1 (with scan switching) vs PowForPush vs Power
    * Method. `epsValues` are ℓ1 budgets; the Power Method sweeps
    * iterations 3..15 step 2 as in the paper.
    */
  def l1Sweep(dataset: String, g: WeightedGraph, sources: Array[Int],
              epsValues: Seq[Double], powerIters: Seq[Int] = 3 to 15 by 2,
              alpha: Double = DefaultAlpha): Seq[SweepRow] = {
    val truths = groundTruths(g, sources, alpha)
    val edgeRows = epsValues.map { eps =>
      val theta = Thresholds.l1(g, eps)
      averaged(dataset, "EdgePush-L1", eps, g, sources, truths,
        // switch to scans only after the heap phase has already done one
        // full scan's worth (2m) of pushes — the §6.2 switching idea
        s => EdgePushSeq.compute(g, s, alpha, theta, scanSwitchFrac = Some(1.0)))
    }
    val pfpRows = epsValues.map { eps =>
      val theta = Thresholds.localPushL1Theta(g, eps)
      averaged(dataset, "PowForPush", eps, g, sources, truths,
        s => PowForPushSeq.compute(g, s, alpha, theta))
    }
    val pmRows = powerIters.map { it =>
      averaged(dataset, "PowerMethod", it.toDouble, g, sources, truths,
        s => PowerMethodSeq.compute(g, s, alpha, it))
    }
    edgeRows ++ pfpRows ++ pmRows
  }

  /** Table-1 style row: predicted vs measured EdgePush/LocalPush cost
    * ratio on one graph, for both error regimes.
    */
  final case class Table1Row(
      graph: String,
      n: Int,
      m: Int,
      cos2Phi: Double,
      predictedL1Ratio: Double,   // (1−α)·cos²φ
      measuredL1Ratio: Double,    // EdgePush work / LocalPush work at ε
      predictedRmaxRatio: Double, // (1−α)/2m·Σ n(v)cos²φ_v
      measuredRmaxRatio: Double,  // ... at r_max
      localPushWorkL1: Double,
      edgePushWorkL1: Double,
      localPushWorkRmax: Double,
      edgePushWorkRmax: Double,
  )

  def table1Row(name: String, g: WeightedGraph, sources: Array[Int],
                eps: Double, rmax: Double,
                alpha: Double = DefaultAlpha): Table1Row = {
    val thetaL1 = Thresholds.l1(g, eps)
    val thetaRm = Thresholds.rmax(g, rmax)
    val lpTheta = Thresholds.localPushL1Theta(g, eps)
    var lpL1, epL1, lpRm, epRm = 0.0
    sources.foreach { s =>
      lpL1 += LocalPushSeq.compute(g, s, alpha, lpTheta).totalWork.toDouble
      epL1 += EdgePushSeq.compute(g, s, alpha, thetaL1).totalWork.toDouble
      lpRm += LocalPushSeq.compute(g, s, alpha, rmax).totalWork.toDouble
      epRm += EdgePushSeq.compute(g, s, alpha, thetaRm).totalWork.toDouble
    }
    val k = sources.length.toDouble
    lpL1 /= k; epL1 /= k; lpRm /= k; epRm /= k
    Table1Row(name, g.n, g.m,
      Unbalancedness.cos2Phi(g),
      Unbalancedness.TheoreticalCost.improvementL1(g, alpha),
      if (lpL1 > 0) epL1 / lpL1 else 0.0,
      Unbalancedness.TheoreticalCost.improvementRmax(g, alpha),
      if (lpRm > 0) epRm / lpRm else 0.0,
      lpL1, epL1, lpRm, epRm)
  }

  /** Fixed-width table printer shared by jobs and benches. */
  def formatTable(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (fmt(headers) +: rows.map(fmt)).mkString("\n")
  }

  def fmtD(x: Double): String =
    if (x == 0) "0"
    else if (math.abs(x) >= 1000) f"$x%.3e"
    else if (math.abs(x) >= 1) f"$x%.3f"
    else f"$x%.3e"

  def sweepTable(rows: Seq[SweepRow]): String = formatTable(
    Seq("dataset", "method", "param", "work", "ms", "l1", "maxAddErr",
      "normMaxAddErr", "prec@50", "normPrec@50", "conductance"),
    rows.map(r => Seq(r.dataset, r.method, fmtD(r.param), fmtD(r.work),
      fmtD(r.millis), fmtD(r.l1), fmtD(r.maxAddErr), fmtD(r.normMaxAddErr),
      fmtD(r.precision50), fmtD(r.normPrecision50), fmtD(r.conductance))))
}
