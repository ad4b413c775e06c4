package repro.core

import repro.SparkSpec
import repro.corpus.{BenchGen, CorpusGen}
import repro.eval.PrCurve

/** End-to-end offline training + online prediction on small-scale data.
  * This is the integration test for the whole Fig 5 pipeline; the bench
  * suites run the same flow at full reproduction scale.
  */
class AutoTestSpec extends SparkSpec {

  // Mirrors the bench configuration (incl. the scaled B_FPR, DESIGN §2 /
  // EXPERIMENTS.md) at a reduced-but-sufficient corpus size.
  private val cfg = AutoTest.AutoTestConfig(
    nCentroids = 100, nPatterns = 30, nSyn = 600, bSize = 300, bFpr = 0.1, seed = 11)

  private lazy val corpus = CorpusGen.generate(CorpusGen.relationalProfile(nCols = 1500))
  private lazy val model = AutoTest.train(spark, corpus, cfg)

  test("training produces a non-trivial R_all across multiple families") {
    assert(model.assessed.size > 50, s"only ${model.assessed.size} assessed candidates")
    val families = model.assessed.map(_.sdc.evalId.takeWhile(_ != ':')).distinct
    assert(families.size >= 3, s"families: $families")
  }

  test("assessed candidates all pass the statistical gates") {
    model.assessed.foreach { a =>
      assert(a.effectSize >= cfg.hThreshold)
      assert(a.pValue <= cfg.pThreshold)
      assert(a.sdc.confidence > 0 && a.sdc.confidence < 1)
    }
  }

  test("distant-supervision detections are plentiful") {
    assert(model.detections.nonEmpty)
    val detectedSyn = model.detections.map(_._1).distinct.size
    assert(detectedSyn > cfg.nSyn / 4, s"only $detectedSyn of ${cfg.nSyn} syn errors detectable")
  }

  test("Fine-Select and Coarse-Select respect the budgets") {
    Seq(model.coarse, model.fine).foreach { sel =>
      assert(sel.selected.nonEmpty)
      assert(sel.selected.size <= cfg.bSize)
      assert(sel.selected.map(_.fpr).sum <= cfg.bFpr + 1e-9)
    }
  }

  test("selection compresses R_all substantially (Table 5's point)") {
    assert(model.fine.selected.size < model.assessed.size)
  }

  test("timings are recorded for every phase (Fig 14 breakdown)") {
    assert(model.timings.keySet == Set("candidate-gen", "coarse-select", "fine-select"))
    assert(model.timings.values.forall(_ >= 0.0))
  }

  test("reselect with a smaller budget returns fewer or equal rules") {
    val small = model.reselect(bSize = 20, delta = Some(cfg.delta))
    assert(small.selected.size <= 20)
  }

  test("Fine-Select detects real errors on an unseen benchmark with high precision") {
    val bench = BenchGen.generate(BenchGen.stProfile(nCols = 400))
    val preds = Predictor.predict(spark, model.fineModel, bench)
    val r = PrCurve.evaluate(preds, bench)
    assert(r.nTrueErrors > 0)
    assert(r.nCorrect > 0, s"no true errors detected (preds=${r.nPredictions})")
    val overallPrecision = r.nCorrect.toDouble / math.max(r.nPredictions, 1)
    assert(overallPrecision > 0.3, s"precision $overallPrecision (${r.nCorrect}/${r.nPredictions})")
    assert(r.prAuc > 0.1, s"PR-AUC ${r.prAuc}")
  }

  test("All-Constraints has more rules but not catastrophically worse precision") {
    val bench = BenchGen.generate(BenchGen.stProfile(nCols = 200))
    val all = model.allConstraintsModel
    assert(all.size > model.fineModel.size)
    val preds = Predictor.predict(spark, all, bench)
    val r = PrCurve.evaluate(preds, bench)
    assert(r.nPredictions < bench.map(_.values.size).sum / 5,
      "All-Constraints should not flag a large fraction of all values")
  }

  test("family ablation drops the corresponding constraints (Table 7 mechanism)") {
    val noPat = AutoTest.train(spark, corpus.take(300),
      cfg.copy(nSyn = 150, dropFamilies = Set(repro.dists.DomainEval.Pattern)))
    assert(!noPat.assessed.exists(_.sdc.evalId.startsWith("pat:")))
  }
}
