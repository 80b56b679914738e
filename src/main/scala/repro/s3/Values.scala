package repro.s3

/** Dynamically-typed values flowing through the S3 Select evaluator.
  *
  * S3 Select reads CSV, so every cell starts life as a string; the engine is
  * schema-aware (unlike real S3 Select, which requires explicit CASTs) and
  * coerces column references to the registered column type. Dates are kept as
  * ISO-8601 strings — lexicographic comparison is then date comparison, which
  * is exactly how PushdownDB pushes date predicates to S3.
  */
sealed trait SValue {
  def isNull: Boolean = this == SNull
}
final case class SLong(v: Long)     extends SValue
final case class SDouble(v: Double) extends SValue
final case class SString(v: String) extends SValue
final case class SBool(v: Boolean)  extends SValue
case object SNull                   extends SValue

object SValue {

  /** Numeric view used by arithmetic and numeric comparison. */
  def asDouble(v: SValue): Double = v match {
    case SLong(x)   => x.toDouble
    case SDouble(x) => x
    case SString(s) => s.trim.toDouble
    case SBool(b)   => if (b) 1.0 else 0.0
    case SNull      => throw new EvalException("NULL used as number")
  }

  def asLong(v: SValue): Long = v match {
    case SLong(x)   => x
    case SDouble(x) => x.toLong
    case SString(s) => val t = s.trim; if (t.contains('.')) t.toDouble.toLong else t.toLong
    case SBool(b)   => if (b) 1L else 0L
    case SNull      => throw new EvalException("NULL used as integer")
  }

  def asString(v: SValue): String = v match {
    case SLong(x)   => x.toString
    case SDouble(x) => x.toString
    case SString(s) => s
    case SBool(b)   => b.toString
    case SNull      => ""
  }

  def asBool(v: SValue): Boolean = v match {
    case SBool(b) => b
    case SNull    => false // SQL: NULL predicate result filters the row out
    case other    => throw new EvalException(s"not a boolean: $other")
  }

  private def bothLongs(a: SValue, b: SValue): Boolean = (a, b) match {
    case (SLong(_), SLong(_)) => true
    case _                    => false
  }

  private def numeric(v: SValue): Boolean = v match {
    case SLong(_) | SDouble(_) => true
    case _                     => false
  }

  /** Three-valued-logic-free comparison: NULL compares as unknown → caller
    * treats non-Bool as filtered. Returns None when either side is NULL.
    */
  def compare(a: SValue, b: SValue): Option[Int] = (a, b) match {
    case (SNull, _) | (_, SNull) => None
    case _ if numeric(a) && numeric(b) =>
      if (bothLongs(a, b)) Some(java.lang.Long.compare(asLong(a), asLong(b)))
      else Some(java.lang.Double.compare(asDouble(a), asDouble(b)))
    case (SString(x), SString(y)) => Some(x.compareTo(y))
    case (SBool(x), SBool(y))     => Some(java.lang.Boolean.compare(x, y))
    // string vs number: coerce the string (CSV cells are strings)
    case (SString(x), _) if numeric(b) => Some(java.lang.Double.compare(x.trim.toDouble, asDouble(b)))
    case (_, SString(y)) if numeric(a) => Some(java.lang.Double.compare(asDouble(a), y.trim.toDouble))
    case _ => throw new EvalException(s"incomparable: $a vs $b")
  }
}

/** Raised for anything outside the S3 Select surface (or a type error). */
final class EvalException(msg: String) extends RuntimeException(msg)

/** Raised when a built SQL string exceeds S3 Select's 256 KB expression
  * limit — operators catch this and degrade (e.g. Bloom join raises its
  * false-positive rate, then falls back to a filtered join).
  */
final class ExpressionTooLargeException(val size: Int, val limit: Int)
    extends RuntimeException(s"S3 Select expression of $size bytes exceeds limit $limit")
