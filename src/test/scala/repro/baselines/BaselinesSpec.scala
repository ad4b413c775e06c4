package repro.baselines

import repro.SparkSpec
import repro.corpus.{CorpusGen, TableColumn}
import repro.domains.Vocab

class BaselinesSpec extends SparkSpec {

  private def col(id: String, vals: Seq[String]) = TableColumn(id, "d", vals, Nil, vals.size.toLong)

  // Fig 2 style columns with one real error each.
  private val monthCol = col("months", Vocab.months.filterNot(_ == "february") :+ "febuary")
  private val unitCol  = col("units", (1 to 19).map(j => s"$j oz") :+ "0.05%")
  private val dateCol  = col("dates", (1 to 15).map(j => s"$j/10/2020") :+ "new facility")
  // Fig 3 trap: valid column with uncommon names.
  private val nameCol = col("names", Vocab.firstName.common.take(12) ++ Vocab.firstName.uncommon.take(3))

  test("z-scores are empty for degenerate columns") {
    assert(ZScoreBaselines.zScores(Array(1.0, 1.0, 1.0)).isEmpty)
    assert(ZScoreBaselines.zScores(Array(1.0, 2.0)).isEmpty)
  }

  test("z-scores standardise: mean 0, sd 1") {
    val z = ZScoreBaselines.zScores(Array(1.0, 2.0, 3.0, 4.0))
    assert(math.abs(z.sum) < 1e-9)
  }

  test("Glove baseline flags the month typo top-ranked") {
    val preds = ZScoreBaselines.glove.detect(monthCol)
    assert(preds.nonEmpty)
    assert(preds.maxBy(_._2)._1 == "febuary")
  }

  test("Glove baseline false-positives on uncommon names (Example 2)") {
    val preds = ZScoreBaselines.glove.detect(nameCol)
    val flaggedUncommon = preds.map(_._1).toSet.intersect(Vocab.firstName.uncommon.take(3).toSet)
    assert(flaggedUncommon.nonEmpty, "expected OOV uncommon names to be flagged as FPs")
  }

  test("Regex baseline flags the unit-column error") {
    val preds = ZScoreBaselines.regex.detect(unitCol)
    assert(preds.map(_._1) == Seq("0.05%"))
  }

  test("DataPrep baseline flags the invalid date") {
    val preds = ZScoreBaselines.dataprep.detect(dateCol)
    assert(preds.map(_._1).contains("new facility"))
  }

  test("all 7 column-type baselines have unique names") {
    val names = ZScoreBaselines.all.map(_.name)
    assert(names.distinct.size == 7)
  }

  test("GPT-sim detects placeholders and typos with high recall") {
    val det = GptSim.fewShotWithCot
    val predsM = det.detect(monthCol).map(_._1)
    val predsD = det.detect(dateCol).map(_._1)
    assert(predsM.contains("febuary"))
    assert(predsD.contains("new facility"))
  }

  test("GPT-sim confidence is coarse (at most 2 levels)") {
    val det = GptSim.fewShotWithCot
    val confs = (monthCol :: unitCol :: dateCol :: Nil).flatMap(det.detect).map(_._2).distinct
    assert(confs.toSet.subsetOf(Set(0.6, 0.9)))
  }

  test("GPT-sim false-positive rate grows across prompt variants") {
    // many columns of unknown code-words: count hallucinated detections
    val codeCols = (0 until 40).map(i => col(s"code$i", (1 to 15).map(j => s"qz${i}_$j xx")))
    def fps(d: ErrorDetector) = codeCols.map(c => d.detect(c).size).sum
    val best = fps(GptSim.fewShotWithCot)
    val worst = fps(GptSim.zeroShotNoCot)
    assert(best < worst, s"few-shot-COT $best vs zero-shot $worst")
  }

  test("GPT-sim typo lookup works via deletion signatures") {
    assert(GptSim.isTypoOfKnown("febuary"))
    assert(GptSim.isTypoOfKnown("seattel"))
    assert(!GptSim.isTypoOfKnown("germany")) // known, not a typo
    assert(!GptSim.isTypoOfKnown("xqzwv"))   // unrelated
  }

  test("Katara maps KB-covered columns and flags non-KB values") {
    val preds = Katara.default.detect(monthCol)
    assert(preds.map(_._1).contains("febuary"))
  }

  test("Katara produces FPs on valid-but-uncommon entities") {
    val preds = Katara.default.detect(nameCol)
    assert(preds.map(_._1).toSet.intersect(Vocab.firstName.uncommon.take(3).toSet).nonEmpty)
  }

  test("Katara skips unmapped columns") {
    assert(Katara.default.detect(unitCol).isEmpty)
  }

  test("AutoDetect learns pattern incompatibility from a corpus") {
    val corpus = CorpusGen.generate(CorpusGen.relationalProfile(nCols = 300))
    val ad = AutoDetect.train(spark, corpus)
    val preds = ad.detect(unitCol)
    assert(preds.map(_._1).contains("0.05%"))
    // but it cannot see semantic (non-pattern) errors
    val semPreds = ad.detect(col("country", Vocab.countriesCommon.take(12) :+ "liechstein"))
    assert(!semPreds.map(_._1).contains("liechstein"))
  }

  test("Vendor-A only fires on strongly dominant patterns") {
    val a = Vendors.vendorA
    assert(a.detect(unitCol).map(_._1) == Seq("0.05%"))
    val mixed = col("mixed", (1 to 6).map(j => s"$j oz") ++ (1 to 6).map(j => s"x$j"))
    assert(a.detect(mixed).isEmpty)
  }

  test("Vendor-B is a conservative spell-checker") {
    val b = Vendors.vendorB
    assert(b.detect(monthCol).map(_._1).contains("febuary"))
    assert(b.detect(unitCol).isEmpty)
  }

  test("DetectorRunner distributes and matches local application") {
    val det = ZScoreBaselines.regex
    val cols = Seq(unitCol, dateCol, monthCol)
    val dist = DetectorRunner.run(spark, det, cols).toSet
    val local = cols.flatMap(c => det.detect(c).map { case (v, s) =>
      repro.core.Prediction(c.colId, v, s)
    }).toSet
    assert(dist == local)
  }
}
