package repro.s3

/** AST for the SQL subset S3 Select accepts (2019-era surface, as used by the
  * paper): single-table SELECT with projection, WHERE, LIMIT; aggregation
  * without GROUP BY; arithmetic, comparison, boolean logic, CAST, SUBSTRING,
  * CASE WHEN, LIKE, IN, BETWEEN. No joins, no GROUP BY, no ORDER BY, no
  * bitwise operators, no binary data — those restrictions force exactly the
  * operator decompositions PushdownDB implements.
  */
object SelectAst {

  sealed trait Expr
  final case class Col(name: String)                          extends Expr
  final case class Lit(v: SValue)                             extends Expr
  final case class Neg(e: Expr)                               extends Expr
  final case class Arith(op: String, l: Expr, r: Expr)        extends Expr // + - * / %
  final case class Cmp(op: String, l: Expr, r: Expr)          extends Expr // = <> < <= > >=
  final case class And(l: Expr, r: Expr)                      extends Expr
  final case class Or(l: Expr, r: Expr)                       extends Expr
  final case class Not(e: Expr)                               extends Expr
  final case class IsNull(e: Expr, negated: Boolean)          extends Expr
  final case class In(e: Expr, values: Seq[Expr], negated: Boolean) extends Expr
  final case class Like(e: Expr, pattern: String, negated: Boolean) extends Expr
  final case class Cast(e: Expr, to: String)                  extends Expr // INT, FLOAT, DECIMAL, STRING…
  final case class Substring(s: Expr, from: Expr, len: Option[Expr]) extends Expr
  final case class CaseWhen(branches: Seq[(Expr, Expr)], otherwise: Option[Expr]) extends Expr
  final case class AggCall(func: String, arg: Option[Expr])   extends Expr // SUM MIN MAX AVG COUNT; arg=None => COUNT(*)

  /** A projection item: expression plus optional alias; Star = `SELECT *`. */
  sealed trait Projection
  case object Star                                      extends Projection
  final case class Proj(e: Expr, alias: Option[String]) extends Projection

  final case class SelectQuery(
      projections: Seq[Projection],
      where: Option[Expr],
      limit: Option[Long],
  ) {
    /** True if any projection contains an aggregate call (engine then runs in
      * aggregate mode and returns exactly one row, as S3 Select does).
      */
    def isAggregate: Boolean = projections.exists {
      case Proj(e, _) => containsAgg(e)
      case Star       => false
    }
  }

  def containsAgg(e: Expr): Boolean = e match {
    case AggCall(_, _)    => true
    case Col(_) | Lit(_)  => false
    case Neg(x)           => containsAgg(x)
    case Arith(_, l, r)   => containsAgg(l) || containsAgg(r)
    case Cmp(_, l, r)     => containsAgg(l) || containsAgg(r)
    case And(l, r)        => containsAgg(l) || containsAgg(r)
    case Or(l, r)         => containsAgg(l) || containsAgg(r)
    case Not(x)           => containsAgg(x)
    case IsNull(x, _)     => containsAgg(x)
    case In(x, vs, _)     => containsAgg(x) || vs.exists(containsAgg)
    case Like(x, _, _)    => containsAgg(x)
    case Cast(x, _)       => containsAgg(x)
    case Substring(s, f, l) => containsAgg(s) || containsAgg(f) || l.exists(containsAgg)
    case CaseWhen(bs, o)  => bs.exists { case (c, v) => containsAgg(c) || containsAgg(v) } || o.exists(containsAgg)
  }

  /** Column names referenced by an expression — used by the columnar
    * (Parquet-lite) scan path to charge IO only for touched columns.
    */
  def referencedColumns(e: Expr): Set[String] = e match {
    case Col(n)           => Set(n.toLowerCase)
    case Lit(_)           => Set.empty
    case Neg(x)           => referencedColumns(x)
    case Arith(_, l, r)   => referencedColumns(l) ++ referencedColumns(r)
    case Cmp(_, l, r)     => referencedColumns(l) ++ referencedColumns(r)
    case And(l, r)        => referencedColumns(l) ++ referencedColumns(r)
    case Or(l, r)         => referencedColumns(l) ++ referencedColumns(r)
    case Not(x)           => referencedColumns(x)
    case IsNull(x, _)     => referencedColumns(x)
    case In(x, vs, _)     => referencedColumns(x) ++ vs.flatMap(referencedColumns)
    case Like(x, _, _)    => referencedColumns(x)
    case Cast(x, _)       => referencedColumns(x)
    case Substring(s, f, l) => referencedColumns(s) ++ referencedColumns(f) ++ l.toSeq.flatMap(referencedColumns)
    case CaseWhen(bs, o) =>
      bs.flatMap { case (c, v) => referencedColumns(c) ++ referencedColumns(v) }.toSet ++
        o.toSeq.flatMap(referencedColumns)
    case AggCall(_, a)    => a.toSeq.flatMap(referencedColumns).toSet
  }

  def referencedColumns(q: SelectQuery): Option[Set[String]] = {
    if (q.projections.contains(Star)) None // touches everything
    else {
      val proj = q.projections.flatMap { case Proj(e, _) => referencedColumns(e); case Star => Set.empty[String] }
      Some(proj.toSet ++ q.where.toSeq.flatMap(referencedColumns))
    }
  }

  /** Count of CASE WHEN branches across projections — drives the S3-side
    * compute slowdown model for the paper's S3-side group-by (§VI).
    */
  def caseTermCount(q: SelectQuery): Int = {
    def count(e: Expr): Int = e match {
      case CaseWhen(bs, o)  => bs.size + bs.map { case (c, v) => count(c) + count(v) }.sum + o.map(count).getOrElse(0)
      case Col(_) | Lit(_)  => 0
      case Neg(x)           => count(x)
      case Arith(_, l, r)   => count(l) + count(r)
      case Cmp(_, l, r)     => count(l) + count(r)
      case And(l, r)        => count(l) + count(r)
      case Or(l, r)         => count(l) + count(r)
      case Not(x)           => count(x)
      case IsNull(x, _)     => count(x)
      case In(x, vs, _)     => count(x) + vs.map(count).sum
      case Like(x, _, _)    => count(x)
      case Cast(x, _)       => count(x)
      case Substring(s, f, l) => count(s) + count(f) + l.map(count).getOrElse(0)
      case AggCall(_, a)    => a.map(count).getOrElse(0)
    }
    q.projections.map { case Proj(e, _) => count(e); case Star => 0 }.sum +
      q.where.map(count).getOrElse(0)
  }

  /** Count of SUBSTRING calls in the WHERE clause = number of Bloom-filter
    * hash probes per row — drives the Bloom expression slowdown model (§V).
    */
  def substringProbeCount(q: SelectQuery): Int = {
    def count(e: Expr): Int = e match {
      case Substring(s, f, l) => 1 + count(s) + count(f) + l.map(count).getOrElse(0)
      case Col(_) | Lit(_)  => 0
      case Neg(x)           => count(x)
      case Arith(_, l, r)   => count(l) + count(r)
      case Cmp(_, l, r)     => count(l) + count(r)
      case And(l, r)        => count(l) + count(r)
      case Or(l, r)         => count(l) + count(r)
      case Not(x)           => count(x)
      case IsNull(x, _)     => count(x)
      case In(x, vs, _)     => count(x) + vs.map(count).sum
      case Like(x, _, _)    => count(x)
      case Cast(x, _)       => count(x)
      case CaseWhen(bs, o)  => bs.map { case (c, v) => count(c) + count(v) }.sum + o.map(count).getOrElse(0)
      case AggCall(_, a)    => a.map(count).getOrElse(0)
    }
    q.where.map(count).getOrElse(0)
  }
}
