package repro.dists

/** Function-based domain evaluation (paper Sec 3, method 4).
  *
  * Eight validation functions in the spirit of DataPrep / python-validators,
  * implemented for real (including Luhn's checksum for credit cards, real
  * calendar bounds for dates). Each yields a 0/1 distance via Eq 4.
  */
object Validators {

  /** M/d/yyyy, M/d/yy, or yyyy-MM-dd with real calendar bounds. */
  def validateDate(raw: String): Boolean = {
    val v = DomainEval.normalize(raw)
    val slash = "^(\\d{1,2})/(\\d{1,2})/(\\d{2}|\\d{4})$".r
    val iso   = "^(\\d{4})-(\\d{1,2})-(\\d{1,2})$".r
    def ok(y: Int, m: Int, d: Int): Boolean = {
      if (m < 1 || m > 12 || d < 1) return false
      val leap = (y % 4 == 0 && y % 100 != 0) || y % 400 == 0
      val days = Seq(31, if (leap) 29 else 28, 31, 30, 31, 30, 31, 31, 30, 31, 30, 31)
      d <= days(m - 1)
    }
    v match {
      case slash(m, d, y) =>
        val year = if (y.length == 2) 1900 + y.toInt else y.toInt
        ok(year, m.toInt, d.toInt)
      case iso(y, m, d) => ok(y.toInt, m.toInt, d.toInt)
      case _            => false
    }
  }

  def validateTime(raw: String): Boolean = {
    val v = DomainEval.normalize(raw)
    val hms = "^(\\d{1,2}):(\\d{2})(?::(\\d{2}))?$".r
    v match {
      case hms(h, m, s) =>
        h.toInt < 24 && m.toInt < 60 && (s == null || s.toInt < 60)
      case _ => false
    }
  }

  def validateUrl(raw: String): Boolean = {
    val v = DomainEval.normalize(raw)
    v.matches("^https?://[a-z0-9][a-z0-9.-]*\\.[a-z]{2,}(?::\\d+)?(?:/[^\\s]*)?$")
  }

  def validateEmail(raw: String): Boolean = {
    val v = DomainEval.normalize(raw)
    v.matches("^[a-z0-9][a-z0-9._%+-]*@[a-z0-9][a-z0-9.-]*\\.[a-z]{2,}$")
  }

  def validateIp(raw: String): Boolean = {
    val v = DomainEval.normalize(raw)
    val parts = v.split("\\.", -1)
    parts.length == 4 && parts.forall { p =>
      p.nonEmpty && p.length <= 3 && p.forall(_.isDigit) && p.toInt <= 255 &&
        !(p.length > 1 && p.startsWith("0"))
    }
  }

  /** Luhn checksum over 13–19 digits (credit-card numbers, paper's [2]). */
  def validateCreditCard(raw: String): Boolean = {
    val digits = DomainEval.normalize(raw).replaceAll("[ -]", "")
    if (digits.length < 13 || digits.length > 19 || !digits.forall(_.isDigit)) return false
    var sum = 0
    var double = false
    var i = digits.length - 1
    while (i >= 0) {
      var d = digits.charAt(i) - '0'
      if (double) { d *= 2; if (d > 9) d -= 9 }
      sum += d
      double = !double
      i -= 1
    }
    sum % 10 == 0
  }

  def validateNumber(raw: String): Boolean = {
    val v = DomainEval.normalize(raw).replace(",", "")
    v.nonEmpty && v.matches("^[+-]?(\\d+(\\.\\d*)?|\\.\\d+)([eE][+-]?\\d+)?$")
  }

  def validatePhone(raw: String): Boolean = {
    val v = DomainEval.normalize(raw)
    v.matches("^(\\+?1[ .-]?)?(\\(\\d{3}\\)|\\d{3})[ .-]?\\d{3}[ .-]?\\d{4}$")
  }

  /** The 8 validation functions, named as in the paper's examples. */
  val all: IndexedSeq[(String, String => Boolean)] = IndexedSeq(
    "validate_date"        -> validateDate _,
    "validate_time"        -> validateTime _,
    "validate_url"         -> validateUrl _,
    "validate_email"       -> validateEmail _,
    "validate_ip"          -> validateIp _,
    "validate_credit_card" -> validateCreditCard _,
    "validate_number"      -> validateNumber _,
    "validate_phone"       -> validatePhone _,
  )
}

/** 0/1 distance from a validation function (Eq 4). */
final class FunctionEval(name: String, fn: String => Boolean) extends DomainEval {
  override val id: String = s"fun:$name"
  override def family: String = DomainEval.Function
  override def distance(v: String): Double = if (fn(v)) 0.0 else 1.0
}

object FunctionEval {
  def allEvals: IndexedSeq[FunctionEval] =
    Validators.all.map { case (n, f) => new FunctionEval(n, f) }
}
