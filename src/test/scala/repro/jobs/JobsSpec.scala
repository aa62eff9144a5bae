package repro.jobs

import repro.SparkSpec

/** Smoke tests: every spark-submit entrypoint's `run` produces a printable
  * table at tiny scale.
  */
class JobsSpec extends SparkSpec {

  test("Table1Job.run emits a row per graph") {
    val out = Table1Job.run(scale = 100, eps = 1e-2, rmax = 1e-4, nSources = 1)
    assert(out.contains("star(Fig1)"))
    assert(out.contains("completeUniform"))
    assert(out.split("\n").length == Table1Job.graphs(100).size + 1)
  }

  test("Table2Job.run emits all eight datasets") {
    val out = Table2Job.run(scale = 300)
    Seq("YT", "LJ", "IC", "OL", "TA", "TH", "BC", "SP").foreach(k =>
      assert(out.contains(k), s"missing $k"))
  }

  test("AddErrSweepJob.run emits method rows") {
    val out = AddErrSweepJob.run(scale = 200, keys = Seq("BC"))
    assert(out.contains("EdgePush-Add") && out.contains("MAPPR"))
  }

  test("L1SweepJob.run emits method rows") {
    val out = L1SweepJob.run(scale = 200, keys = Seq("BC"))
    assert(out.contains("EdgePush-L1") && out.contains("PowForPush") &&
      out.contains("PowerMethod"))
  }

  test("UnbalancednessJob.run emits all four affinity configs") {
    val out = UnbalancednessJob.run(n = 80, nSources = 1)
    (1 to 4).foreach(i => assert(out.contains(s"affinity#$i"), s"missing affinity#$i"))
  }

  test("DistDataflowJob.run compares the two dataflow methods") {
    val out = DistDataflowJob.run(spark, n = 150, rmax = 1e-3)
    assert(out.contains("LocalPushDF") && out.contains("EdgePushDF"))
  }
}
