package repro.corpus

import org.apache.spark.sql.{DataFrame, SparkSession, functions => F}

/** A single table column — the unit of both training corpora and benchmarks.
  *
  * @param colId     stable unique id
  * @param domainTag generating semantic domain (held out from all learners;
  *                  only used by generators and for diagnostics)
  * @param values    the column's *distinct* values (SDC pre/post conditions
  *                  operate on the distinct-value set; see DESIGN §5)
  * @param errors    labelled erroneous values (ground truth; empty if clean)
  * @param nTotalVals total value count including duplicates (Table 3 stats)
  */
final case class TableColumn(
    colId: String,
    domainTag: String,
    values: Seq[String],
    errors: Seq[String],
    nTotalVals: Long,
) {
  def isDirty: Boolean = errors.nonEmpty
}

/** DataFrame conversions for column collections.
  *
  * Corpora live as DataFrames with schema
  * (col_id, domain_tag, values: array<string>, errors: array<string>,
  * n_total_vals) and are exploded to (col_id, value) for the distance passes.
  */
object ColumnStore {

  def toDf(spark: SparkSession, cols: Seq[TableColumn]): DataFrame = {
    import spark.implicits._
    cols.toDF()
      .select(
        F.col("colId").as("col_id"),
        F.col("domainTag").as("domain_tag"),
        F.col("values"),
        F.col("errors"),
        F.col("nTotalVals").as("n_total_vals"),
      )
  }

  /** (col_id, value) rows — one per distinct value per column. */
  def explode(df: DataFrame): DataFrame =
    df.select(F.col("col_id"), F.explode(F.col("values")).as("value"))

  def fromDf(df: DataFrame): Seq[TableColumn] = {
    df.collect().toSeq.map { r =>
      TableColumn(
        colId = r.getAs[String]("col_id"),
        domainTag = r.getAs[String]("domain_tag"),
        // Spark hands back mutable ArraySeq; normalise to immutable Vector.
        values = r.getSeq[String](r.fieldIndex("values")).toVector,
        errors = r.getSeq[String](r.fieldIndex("errors")).toVector,
        nTotalVals = r.getAs[Long]("n_total_vals"),
      )
    }
  }

  /** Table-3-style statistics: (#cols, mean/median #vals, mean/median #distinct). */
  final case class CorpusStats(
      nColumns: Long,
      meanVals: Double,
      medianVals: Double,
      meanDistinct: Double,
      medianDistinct: Double,
  )

  def stats(df: DataFrame): CorpusStats = {
    val agg = df
      .select(
        F.count(F.lit(1)).as("n"),
        F.avg(F.col("n_total_vals")).as("mean_vals"),
        F.percentile_approx(F.col("n_total_vals"), F.lit(0.5), F.lit(10000)).as("med_vals"),
        F.avg(F.size(F.col("values"))).as("mean_dist"),
        F.percentile_approx(F.size(F.col("values")), F.lit(0.5), F.lit(10000)).as("med_dist"),
      )
      .collect()(0)
    CorpusStats(
      nColumns = agg.getAs[Long]("n"),
      meanVals = agg.getAs[Double]("mean_vals"),
      medianVals = agg.getAs[Number]("med_vals").doubleValue(),
      meanDistinct = agg.getAs[Double]("mean_dist"),
      medianDistinct = agg.getAs[Number]("med_dist").doubleValue(),
    )
  }
}
