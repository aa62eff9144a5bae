package repro.graphgen

import org.scalatest.funsuite.AnyFunSuite
import repro.metrics.Unbalancedness

class DatasetsSpec extends AnyFunSuite {

  private val scale = 800
  private lazy val built = Datasets.all.map(s => s.key -> s.build(scale)).toMap

  test("all eight stand-ins build and are non-trivial") {
    Datasets.all.foreach { spec =>
      val g = built(spec.key)
      assert(g.m > 50, s"${spec.key}: only ${g.m} edges")
      assert(g.wgt.forall(_ > 0), spec.key)
    }
  }

  test("byKey finds every dataset; unknown key throws") {
    Datasets.all.foreach(s => assert(Datasets.byKey(s.key).key == s.key))
    intercept[NoSuchElementException](Datasets.byKey("nope"))
  }

  test("TH stand-in is the most balanced (paper: cos2phi = 0.97)") {
    val th = Unbalancedness.cos2Phi(built("TH"))
    assert(th > 0.9, s"TH cos2phi=$th")
    Datasets.all.filter(_.key != "TH").foreach { spec =>
      assert(Unbalancedness.cos2Phi(built(spec.key)) < th,
        s"${spec.key} should be less balanced than TH")
    }
  }

  test("heavy-tailed stand-ins (TA, SP) are clearly unbalanced") {
    assert(Unbalancedness.cos2Phi(built("TA")) < 0.6)
    assert(Unbalancedness.cos2Phi(built("SP")) < 0.6)
  }

  test("motif stand-ins have integer-valued weights (triangle counts)") {
    Seq("YT", "LJ", "IC", "OL").foreach { key =>
      val g = built(key)
      assert(g.wgt.forall(w => w == math.rint(w) && w >= 1.0), key)
    }
  }

  test("paper metadata is recorded for all datasets") {
    Datasets.all.foreach { s =>
      assert(s.paperN > 0 && s.paperM > 0 && s.paperCos2 > 0 && s.paperCos2 <= 1)
    }
  }

  test("builders are deterministic") {
    val a = Datasets.byKey("BC").build(300)
    val b = Datasets.byKey("BC").build(300)
    assert(a.m == b.m && a.wgt.toSeq == b.wgt.toSeq)
  }
}
