package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Prediction
import repro.corpus.TableColumn

class PrCurveSpec extends AnyFunSuite {

  private def col(id: String, values: Seq[String], errors: Seq[String]): TableColumn =
    TableColumn(id, "d", values, errors, values.size.toLong)

  private val bench = Seq(
    col("c1", Seq("a", "b", "ERR1"), Seq("ERR1")),
    col("c2", Seq("x", "y", "ERR2"), Seq("ERR2")),
    col("c3", Seq("p", "q"), Seq.empty),
  )

  test("truthOf maps columns to their error sets") {
    val t = PrCurve.truthOf(bench)
    assert(t("c1") == Set("ERR1"))
    assert(t("c3") == Set.empty)
  }

  test("totalErrors sums labelled errors") {
    assert(PrCurve.totalErrors(bench) == 2)
  }

  test("perfect predictions: AUC 1, F1@P=0.8 = 1") {
    val preds = Seq(Prediction("c1", "ERR1", 0.9), Prediction("c2", "ERR2", 0.8))
    val r = PrCurve.evaluate(preds, bench)
    assert(math.abs(r.prAuc - 1.0) < 1e-9)
    assert(math.abs(r.f1AtP80 - 1.0) < 1e-9)
    assert(r.nCorrect == 2 && r.nPredictions == 2)
  }

  test("no predictions: AUC 0, F1 0") {
    val r = PrCurve.evaluate(Seq.empty, bench)
    assert(r.prAuc == 0.0 && r.f1AtP80 == 0.0)
  }

  test("all-wrong predictions: AUC 0") {
    val preds = Seq(Prediction("c3", "p", 0.9), Prediction("c1", "a", 0.8))
    val r = PrCurve.evaluate(preds, bench)
    assert(r.prAuc == 0.0 && r.nCorrect == 0)
  }

  test("precision plateau below 0.8 gives F1@P=0.8 = 0 (the GPT rows of Table 4)") {
    // 1 correct then 1 wrong at every confidence level → precision <= 0.5
    val preds = Seq(
      Prediction("c1", "ERR1", 0.9), Prediction("c1", "a", 0.9),
      Prediction("c2", "ERR2", 0.5), Prediction("c2", "x", 0.5))
    val r = PrCurve.evaluate(preds, bench)
    assert(r.f1AtP80 == 0.0)
    assert(r.prAuc > 0.0)
  }

  test("ranking by confidence: early mistakes hurt AUC more") {
    val good = Seq(Prediction("c1", "ERR1", 0.9), Prediction("c3", "p", 0.1))
    val bad  = Seq(Prediction("c1", "ERR1", 0.1), Prediction("c3", "p", 0.9))
    val rg = PrCurve.evaluate(good, bench)
    val rb = PrCurve.evaluate(bad, bench)
    assert(rg.prAuc > rb.prAuc)
  }

  test("duplicate (col,value) predictions are deduplicated keeping max confidence") {
    val preds = Seq(Prediction("c1", "ERR1", 0.3), Prediction("c1", "ERR1", 0.9))
    val r = PrCurve.evaluate(preds, bench)
    assert(r.nPredictions == 1)
    assert(r.points.head.threshold == 0.9)
  }

  test("tie-groups are evaluated as one operating point") {
    val preds = Seq(
      Prediction("c1", "ERR1", 0.5), Prediction("c2", "ERR2", 0.5), Prediction("c3", "p", 0.5))
    val r = PrCurve.evaluate(preds, bench)
    assert(r.points.size == 1)
    assert(math.abs(r.points.head.precision - 2.0 / 3.0) < 1e-9)
    assert(math.abs(r.points.head.recall - 1.0) < 1e-9)
  }

  test("recall uses the benchmark's total error count, not the prediction count") {
    val preds = Seq(Prediction("c1", "ERR1", 0.9))
    val r = PrCurve.evaluate(preds, bench)
    assert(math.abs(r.points.last.recall - 0.5) < 1e-9)
  }

  test("AUC of a half-right ranking is between 0 and 1") {
    val preds = Seq(
      Prediction("c1", "ERR1", 0.9), Prediction("c3", "q", 0.7),
      Prediction("c2", "ERR2", 0.6))
    val r = PrCurve.evaluate(preds, bench)
    assert(r.prAuc > 0.4 && r.prAuc < 1.0)
  }

  test("F1@P=0.8 picks the best qualifying operating point") {
    // point 1: P=1.0, R=0.5 → F1 = 2/3; point 2: P=2/3 < 0.8 (excluded)
    val preds = Seq(
      Prediction("c1", "ERR1", 0.9),
      Prediction("c3", "p", 0.5), Prediction("c2", "ERR2", 0.5))
    val r = PrCurve.evaluate(preds, bench)
    assert(math.abs(r.f1AtP80 - 2.0 / 3.0) < 1e-9)
  }
}
