package repro.outlier

/** Per-value feature extraction for the classical outlier-detection
  * baselines (paper Sec 6.2, third group). These methods operate on *local*
  * statistical features within one column — precisely the limitation the
  * paper contrasts with corpus-level SDC learning.
  */
object Features {

  val Dim = 8

  /** 8-dimensional syntactic feature vector of a cell value. */
  def of(raw: String): Array[Double] = {
    val v = if (raw == null) "" else raw.trim
    val n = math.max(v.length, 1)
    val digits = v.count(_.isDigit)
    val alphas = v.count(_.isLetter)
    val uppers = v.count(_.isUpper)
    val puncts = v.count(c => !c.isLetterOrDigit && !c.isWhitespace)
    val tokens = v.split("\\s+").count(_.nonEmpty)
    Array(
      math.min(v.length, 40) / 40.0,
      digits.toDouble / n,
      alphas.toDouble / n,
      uppers.toDouble / n,
      puncts.toDouble / n,
      math.min(tokens, 8) / 8.0,
      charEntropy(v) / 4.0,
      if (v.isEmpty) 0.0 else (v.head.toInt % 128) / 128.0,
    )
  }

  /** Shannon entropy over the value's characters (bits). */
  def charEntropy(v: String): Double = {
    if (v.isEmpty) return 0.0
    val counts = v.groupBy(identity).map(_._2.length.toDouble)
    val n = v.length.toDouble
    -counts.map { c => val p = c / n; p * math.log(p) / math.log(2.0) }.sum
  }

  def matrix(values: Seq[String]): Array[Array[Double]] = values.map(of).toArray
}
