package repro.dists

import org.apache.spark.sql.{DataFrame, functions => F}

/** Pattern-based domain evaluation (paper Sec 3, method 3).
  *
  * Values are generalised to regex-like patterns by collapsing character
  * runs: digits → `\d+`, letters → `[a-zA-Z]+`, whitespace → a single space,
  * other characters kept as literals. A pattern p then defines the 0/1
  * distance f_pat^d(p, v) of Eq 3.
  *
  * The pattern *miner* reproduces Sec 5.1's "generate common patterns
  * observed in our corpus": patterns are ranked by how many corpus columns
  * they dominate, computed as a Spark aggregation.
  */
object Patterns {

  /** Generalise a value into its character-class pattern. */
  def generalize(raw: String): String = {
    val v = if (raw == null) "" else raw.trim
    if (v.isEmpty) return "<empty>"
    val sb = new StringBuilder
    var i = 0
    while (i < v.length) {
      val c = v.charAt(i)
      if (c.isDigit) {
        while (i < v.length && v.charAt(i).isDigit) i += 1
        // Number token: a digit run with one optional decimal part ("9.8"
        // and "12" generalise alike, as real pattern languages do).
        if (i + 1 < v.length && v.charAt(i) == '.' && v.charAt(i + 1).isDigit) {
          i += 1
          while (i < v.length && v.charAt(i).isDigit) i += 1
        }
        sb.append("\\d+")
      } else if (c.isLetter) {
        while (i < v.length && v.charAt(i).isLetter) i += 1
        sb.append("[a-zA-Z]+")
      } else if (c.isWhitespace) {
        while (i < v.length && v.charAt(i).isWhitespace) i += 1
        sb.append(' ')
      } else {
        sb.append(c)
        i += 1
      }
    }
    // Long mixed patterns are truncated to bound pattern-space cardinality.
    val p = sb.toString
    if (p.length > 60) p.substring(0, 60) + "…" else p
  }

  /** Mine the `topK` patterns that most often *dominate* a corpus column
    * (dominance = the pattern covers >= `domFrac` of the column's values).
    * Input: DataFrame with (col_id: string, value: string).
    */
  def minePatterns(exploded: DataFrame, topK: Int = 45, domFrac: Double = 0.8): Seq[String] = {
    import exploded.sparkSession.implicits._
    val genUdf = F.udf((v: String) => generalize(v))
    val perColPattern = exploded
      .select($"col_id", genUdf($"value").as("pattern"))
      .groupBy($"col_id", $"pattern")
      .agg(F.count(F.lit(1)).as("cnt"))
    val colSizes = perColPattern.groupBy($"col_id").agg(F.sum($"cnt").as("total"))
    perColPattern
      .join(colSizes, "col_id")
      .where($"cnt" >= $"total" * domFrac)
      .groupBy($"pattern")
      .agg(F.count(F.lit(1)).as("nDominated"))
      .where($"pattern" =!= "<empty>")
      .orderBy(F.desc("nDominated"), $"pattern")
      .limit(topK)
      .select($"pattern")
      .as[String]
      .collect()
      .toSeq
  }
}

/** 0/1 distance to a fixed pattern (Eq 3). */
final class PatternEval(pattern: String) extends DomainEval {
  override val id: String = s"pat:$pattern"
  override def family: String = DomainEval.Pattern
  override def distance(v: String): Double =
    if (Patterns.generalize(v) == pattern) 0.0 else 1.0
}
