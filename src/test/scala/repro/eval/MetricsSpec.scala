package repro.eval

import repro.SparkSpec
import repro.core.{Comparison, GroundTruth}
import org.scalactic.Tolerance._

class MetricsSpec extends SparkSpec {

  private val gt = GroundTruth(Set((0, 1), (2, 3)))

  test("recallCurve counts matches as they are emitted") {
    val em = Iterator(Comparison(0, 1, 0), Comparison(0, 2, 0), Comparison(2, 3, 0))
    assert(Metrics.recallCurve(em, gt, 10).toSeq === Seq(0.5, 0.5, 1.0))
  }

  test("recallCurve ignores repeated matching emissions") {
    val em = Iterator(Comparison(0, 1, 0), Comparison(0, 1, 0), Comparison(2, 3, 0))
    assert(Metrics.recallCurve(em, gt, 10).toSeq === Seq(0.5, 0.5, 1.0))
  }

  test("recallCurve stops at maxEmissions") {
    val em = Iterator.continually(Comparison(0, 2, 0))
    assert(Metrics.recallCurve(em, gt, 3).length === 3)
  }

  test("recallCurve is monotonically non-decreasing") {
    val em = Iterator(Comparison(0, 1, 0), Comparison(0, 3, 0), Comparison(2, 3, 0), Comparison(1, 2, 0))
    val c = Metrics.recallCurve(em, gt, 10)
    assert(c.zip(c.tail).forall { case (a, b) => a <= b })
  }

  test("aucIdeal matches the hand-computed value") {
    // |D|=4, ec*=2 → emissions 1..8, recall 0.25 0.5 0.75 1 1 1 1 1 → 6.5/4
    assert(Metrics.aucIdeal(4, 2.0) === 6.5 / 4 +- 1e-12)
  }

  test("the ideal curve has AUC* = 1 at every ec*") {
    val ideal = Array(0.25, 0.5, 0.75, 1.0)
    for (e <- Seq(1.0, 2.0, 5.0))
      assert(Metrics.aucStar(ideal, 4, e) === 1.0 +- 1e-12)
  }

  test("auc pads a terminated curve with its final recall") {
    // curve ends at recall 0.5 after 2 emissions; at ec*=2 (8 emissions):
    // contributions 0.25, 0.5, then 6×0.5 → 3.75/4
    val curve = Array(0.25, 0.5)
    assert(Metrics.auc(curve, 4, 2.0) === 3.75 / 4 +- 1e-12)
  }

  test("an empty curve has zero AUC") {
    assert(Metrics.auc(Array.empty, 4, 5.0) === 0.0)
  }

  test("aucStar is within [0, 1] for any sane curve") {
    val curve = Array(0.0, 0.25, 0.25, 0.5, 1.0)
    for (e <- Seq(1.0, 5.0, 30.0)) {
      val s = Metrics.aucStar(curve, 4, e)
      assert(s >= 0.0 && s <= 1.0)
    }
  }

  test("a method finding matches earlier has higher AUC*") {
    val early = Array(0.5, 1.0, 1.0, 1.0)
    val late  = Array(0.0, 0.0, 0.5, 1.0)
    assert(Metrics.aucStar(early, 2, 2.0) > Metrics.aucStar(late, 2, 2.0))
  }
}
