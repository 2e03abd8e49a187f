package repro.core

/** Column type inference, mirroring the paper's Column Type Embedding
  * (§3, item 4): best-effort parse of the first 10 non-null values as
  * date, integer, or float; default to string.
  */
object TypeInference {

  sealed trait ColType { def name: String }
  case object StringT extends ColType { val name = "string" }
  case object IntT    extends ColType { val name = "int" }
  case object FloatT  extends ColType { val name = "float" }
  case object DateT   extends ColType { val name = "date" }

  val all: Seq[ColType] = Seq(StringT, IntT, FloatT, DateT)

  private val IsoDate   = """(\d{4})-(\d{2})-(\d{2})""".r
  private val SlashDate = """(\d{1,2})/(\d{1,2})/(\d{2,4})""".r

  /** Days-since-epoch-ish timestamp for a date-looking value; None if the
    * value does not parse as a date. Approximate month lengths are fine —
    * the sketch only needs a monotone numeric encoding (paper: "convert
    * date columns into timestamps and treat them as numeric").
    */
  def parseDate(s: String): Option[Double] = s match {
    case null => None
    case IsoDate(y, m, d)   => Some(y.toInt * 372.0 + (m.toInt - 1) * 31 + (d.toInt - 1))
    case SlashDate(d, m, y) =>
      val yy = if (y.length == 2) 2000 + y.toInt else y.toInt
      if (m.toInt >= 1 && m.toInt <= 12 && d.toInt >= 1 && d.toInt <= 31)
        Some(yy * 372.0 + (m.toInt - 1) * 31 + (d.toInt - 1))
      else None
    case _ => None
  }

  def parseLong(s: String): Option[Long] =
    if (s == null) None
    else try { Some(java.lang.Long.parseLong(s.trim)) } catch { case _: NumberFormatException => None }

  def parseDouble(s: String): Option[Double] =
    if (s == null) None
    else try {
      val d = java.lang.Double.parseDouble(s.trim)
      if (java.lang.Double.isFinite(d)) Some(d) else None
    } catch { case _: NumberFormatException => None }

  /** Infer the type of a column from (up to) its first 10 non-null values. */
  def infer(values: Iterable[String]): ColType = {
    val sample = values.iterator.filter(v => v != null && v.trim.nonEmpty).take(10).toSeq
    if (sample.isEmpty) StringT
    else if (sample.forall(parseDate(_).isDefined)) DateT
    else if (sample.forall(parseLong(_).isDefined)) IntT
    else if (sample.forall(parseDouble(_).isDefined)) FloatT
    else StringT
  }

  /** Numeric view of a cell under an inferred type; None for non-numeric
    * cells (they count as NaN in the numerical sketch).
    */
  def numericValue(s: String, t: ColType): Option[Double] = t match {
    case DateT           => parseDate(s)
    case IntT | FloatT   => parseDouble(s)
    case StringT         => None
  }
}
