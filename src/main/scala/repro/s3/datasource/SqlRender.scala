package repro.s3.datasource

import repro.s3._
import repro.s3.SelectAst._

/** Renders a [[SelectAst]] back to S3 Select SQL text.
  *
  * The connector always ships queries to the storage layer as SQL strings —
  * same wire format as the real service — so the 256 KB expression limit is
  * enforced on exactly what would be sent.
  */
object SqlRender {

  def render(q: SelectQuery): String = {
    val projs = q.projections.map {
      case Star                 => "*"
      case Proj(e, None)        => render(e)
      case Proj(e, Some(alias)) => s"${render(e)} AS $alias"
    }.mkString(", ")
    val where = q.where.map(w => s" WHERE ${render(w)}").getOrElse("")
    val limit = q.limit.map(l => s" LIMIT $l").getOrElse("")
    s"SELECT $projs FROM S3Object$where$limit"
  }

  def render(e: Expr): String = e match {
    case Col(n)          => n
    case Lit(v)          => lit(v)
    case Neg(x)          => s"(- ${render(x)})"
    case Arith(op, l, r) => s"(${render(l)} $op ${render(r)})"
    case Cmp(op, l, r)   => s"(${render(l)} $op ${render(r)})"
    case And(l, r)       => s"(${render(l)} AND ${render(r)})"
    case Or(l, r)        => s"(${render(l)} OR ${render(r)})"
    case Not(x)          => s"(NOT ${render(x)})"
    case IsNull(x, neg)  => s"(${render(x)} IS ${if (neg) "NOT " else ""}NULL)"
    case In(x, vs, neg)  => s"(${render(x)} ${if (neg) "NOT " else ""}IN (${vs.map(render).mkString(", ")}))"
    case Like(x, p, neg) => s"(${render(x)} ${if (neg) "NOT " else ""}LIKE ${lit(SString(p))})"
    case Cast(x, to)     => s"CAST(${render(x)} AS $to)"
    case Substring(s, f, None)    => s"SUBSTRING(${render(s)}, ${render(f)})"
    case Substring(s, f, Some(l)) => s"SUBSTRING(${render(s)}, ${render(f)}, ${render(l)})"
    case CaseWhen(bs, o) =>
      val whens = bs.map { case (c, v) => s"WHEN ${render(c)} THEN ${render(v)}" }.mkString(" ")
      val els   = o.map(v => s" ELSE ${render(v)}").getOrElse("")
      s"CASE $whens$els END"
    case AggCall("COUNT", None) => "COUNT(*)"
    case AggCall(f, Some(a))    => s"$f(${render(a)})"
    case AggCall(f, None)       => throw new EvalException(s"$f without argument")
  }

  private def lit(v: SValue): String = v match {
    case SLong(x)   => x.toString
    case SDouble(x) => x.toString
    case SString(s) => "'" + s.replace("'", "''") + "'"
    case SBool(b)   => b.toString.toUpperCase
    case SNull      => "NULL"
  }
}
