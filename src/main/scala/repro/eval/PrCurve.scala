package repro.eval

import repro.core.Prediction
import repro.corpus.TableColumn

/** Precision/recall evaluation (paper Sec 6.1): PR curves summarised by
  * PR-AUC (average precision over the ranked predictions) and F1@P=0.8
  * (best F1 among operating points with precision >= 0.8; 0 if the curve
  * never reaches that precision — the paper's many "0, x" cells).
  */
object PrCurve {

  final case class PrPoint(threshold: Double, precision: Double, recall: Double)

  final case class PrResult(
      points: IndexedSeq[PrPoint],
      prAuc: Double,
      f1AtP80: Double,
      nPredictions: Int,
      nCorrect: Int,
      nTrueErrors: Int,
  )

  /** Ground truth lookup from labelled benchmark columns. */
  def truthOf(cols: Seq[TableColumn]): Map[String, Set[String]] =
    cols.iterator.map(c => c.colId -> c.errors.toSet).toMap

  def totalErrors(cols: Seq[TableColumn]): Int = cols.iterator.map(_.errors.size).sum

  /** Evaluate ranked predictions against ground truth.
    *
    * Predictions are deduplicated per (colId, value) keeping the max
    * confidence; ties in confidence are processed as one operating point so
    * coarse-confidence methods (LLMs, KB mappers) are scored fairly.
    */
  def evaluate(preds: Seq[Prediction], cols: Seq[TableColumn]): PrResult = {
    val truth = truthOf(cols)
    val nTrue = totalErrors(cols)
    val dedup = preds
      .groupBy(p => (p.colId, p.value))
      .map { case (_, ps) => ps.maxBy(_.confidence) }
      .toIndexedSeq
    val ranked = dedup.sortBy(p => (-p.confidence, p.colId, p.value))

    val points = IndexedSeq.newBuilder[PrPoint]
    var tp = 0
    var fp = 0
    var auc = 0.0
    var prevRecall = 0.0
    var f1Best = 0.0
    var i = 0
    while (i < ranked.length) {
      // consume the whole tie-group at this confidence
      val conf = ranked(i).confidence
      while (i < ranked.length && ranked(i).confidence == conf) {
        val p = ranked(i)
        if (truth.getOrElse(p.colId, Set.empty).contains(p.value)) tp += 1 else fp += 1
        i += 1
      }
      val precision = tp.toDouble / (tp + fp)
      val recall = if (nTrue == 0) 0.0 else tp.toDouble / nTrue
      points += PrPoint(conf, precision, recall)
      auc += (recall - prevRecall) * precision // average precision (step-wise)
      prevRecall = recall
      if (precision >= 0.8 && precision + recall > 0) {
        val f1 = 2 * precision * recall / (precision + recall)
        if (f1 > f1Best) f1Best = f1
      }
    }
    PrResult(points.result(), auc, f1Best, ranked.length, tp, nTrue)
  }
}
