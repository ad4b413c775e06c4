package repro.baselines

import org.apache.spark.sql.{SparkSession, functions => F}
import repro.corpus.{ColumnStore, TableColumn}
import repro.dists.Patterns

/** Auto-Detect-style detector (paper Sec 6.2, [33]): flags values whose
  * syntactic pattern rarely co-occurs with the column's dominant pattern,
  * using corpus-level pattern co-occurrence statistics (computed here as a
  * Spark aggregation over the training corpus). Pattern-only, so coverage is
  * limited to syntax-structured errors — the limitation the paper notes.
  */
final class AutoDetect(
    patternCols: Map[String, Long],
    coocCols: Map[(String, String), Long],
    nCols: Long,
) extends ErrorDetector {

  override val name = "AutoDetect"

  /** Incompatibility of a value pattern with the column's dominant pattern:
    * −log P(pVal co-occurs | column has pDom), smoothed. High when the pair
    * essentially never co-occurs in clean corpus columns.
    */
  private def incompatibility(pDom: String, pVal: String): Double = {
    if (pDom == pVal) return 0.0
    val cD = patternCols.getOrElse(pDom, 0L).toDouble
    val key = if (pDom <= pVal) (pDom, pVal) else (pVal, pDom)
    val cDV = coocCols.getOrElse(key, 0L).toDouble
    -math.log((cDV + 0.5) / (cD + 1.0))
  }

  override def detect(col: TableColumn): Seq[(String, Double)] = {
    if (col.values.size < 4) return Seq.empty
    val pats = col.values.map(Patterns.generalize)
    val byPat = pats.groupBy(identity)
    val (dominant, doms) = byPat.maxBy(_._2.size)
    if (doms.size.toDouble / col.values.size < 0.7) return Seq.empty
    // log 2 ⇔ co-occurrence probability below ~1/2: only flag genuinely
    // rare pattern pairs, not common companions (e.g. two date formats).
    col.values.indices.collect {
      case i if pats(i) != dominant =>
        (col.values(i), incompatibility(dominant, pats(i)))
    }.filter(_._2 > math.log(2.0))
  }
}

object AutoDetect {

  /** Train co-occurrence statistics from a corpus (Spark aggregation). */
  def train(spark: SparkSession, corpus: Seq[TableColumn]): AutoDetect = {
    import spark.implicits._
    val df = ColumnStore.toDf(spark, corpus)
    val genUdf = F.udf((v: String) => Patterns.generalize(v))
    // distinct patterns per column
    val colPat = ColumnStore.explode(df)
      .select($"col_id", genUdf($"value").as("pattern"))
      .distinct()
      .cache()
    val single = colPat.groupBy($"pattern").agg(F.count(F.lit(1)).as("n"))
      .as[(String, Long)].collect().toMap
    val cooc = colPat.as("a")
      .join(colPat.as("b"), F.col("a.col_id") === F.col("b.col_id") &&
        F.col("a.pattern") < F.col("b.pattern"))
      .groupBy(F.col("a.pattern").as("p"), F.col("b.pattern").as("q"))
      .agg(F.count(F.lit(1)).as("n"))
      .as[(String, String, Long)].collect()
      .map { case (p, q, n) => ((p, q), n) }.toMap
    colPat.unpersist()
    new AutoDetect(single, cooc, corpus.size.toLong)
  }
}
