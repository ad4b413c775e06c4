package repro.core

import org.apache.spark.sql.SparkSession
import repro.corpus.TableColumn
import repro.dists.{DomainEval, EvalRegistry}

/** One error prediction: `value` in column `colId` is flagged with the given
  * confidence (max over all triggering SDCs, Example 3).
  */
final case class Prediction(colId: String, value: String, confidence: Double)

/** An executable set of SDCs (the online-prediction stage, paper Fig 5).
  *
  * Applies the Appendix B.2 optimisation: SDCs sharing a pre-condition
  * (evalId, d_in, m) are grouped so each pre-condition — and each
  * evaluator's distance vector — is computed once per column.
  */
final class SdcModel(val sdcs: IndexedSeq[Sdc], registry: EvalRegistry) extends Serializable {

  /** evaluator -> pre-condition groups -> member SDCs */
  private val byEval: IndexedSeq[(DomainEval, IndexedSeq[((Double, Double), IndexedSeq[Sdc])])] =
    sdcs.groupBy(_.evalId).toIndexedSeq.sortBy(_._1).map { case (evalId, ss) =>
      val eval = registry.byId.getOrElse(evalId,
        throw new IllegalArgumentException(s"model references unknown evaluator $evalId"))
      val groups = ss.groupBy(s => (s.dIn, s.m)).toIndexedSeq.sortBy(_._1)
      (eval, groups)
    }

  def size: Int = sdcs.size

  /** Distinct pre-conditions after dedup (latency driver, Appendix B.2). */
  def nPreConditions: Int = byEval.iterator.map(_._2.size).sum

  /** SDCs whose pre-condition holds on the column (the "covered by" relation
    * of Sec 5.2 — used for Table 9's column-level coverage reporting).
    */
  def coveringSdcs(values: Seq[String]): IndexedSeq[Sdc] = {
    if (values.isEmpty) return IndexedSeq.empty
    val arr = values.toArray
    val n = arr.length
    val out = IndexedSeq.newBuilder[Sdc]
    byEval.foreach { case (eval, groups) =>
      val dists = Assessment.distancesOf(eval, arr)
      groups.foreach { case ((dIn, m), members) =>
        if (dists.count(_ <= dIn).toDouble / n >= m) out ++= members
      }
    }
    out.result()
  }

  /** Predict errors in one column: flagged value -> max confidence. */
  def predictColumn(values: Seq[String]): Map[String, Double] = {
    if (values.isEmpty) return Map.empty
    val arr = values.toArray
    val n = arr.length
    val acc = scala.collection.mutable.Map.empty[String, Double]
    byEval.foreach { case (eval, groups) =>
      val dists = Assessment.distancesOf(eval, arr)
      groups.foreach { case ((dIn, m), members) =>
        var inInner = 0
        var i = 0
        while (i < n) { if (dists(i) <= dIn) inInner += 1; i += 1 }
        if (inInner.toDouble / n >= m) {
          members.foreach { s =>
            var j = 0
            while (j < n) {
              if (dists(j) > s.dOut) {
                val v = arr(j)
                if (acc.getOrElse(v, -1.0) < s.confidence) acc(v) = s.confidence
              }
              j += 1
            }
          }
        }
      }
    }
    acc.toMap
  }
}

object Predictor {

  def predictLocal(model: SdcModel, col: TableColumn): Seq[Prediction] =
    model.predictColumn(col.values).toSeq.map { case (v, c) => Prediction(col.colId, v, c) }

  /** Distributed prediction over many columns. */
  def predict(spark: SparkSession, model: SdcModel, cols: Seq[TableColumn]): IndexedSeq[Prediction] = {
    val bc = spark.sparkContext.broadcast(model)
    spark.sparkContext
      .parallelize(cols, math.max(1, math.min(64, cols.size / 16)))
      .flatMap { col =>
        bc.value.predictColumn(col.values).map { case (v, c) => Prediction(col.colId, v, c) }
      }
      .collect()
      .toIndexedSeq
  }
}
