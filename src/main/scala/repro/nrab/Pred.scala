package repro.nrab

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.lit

/** Scalar expressions over the attributes of an NRAB operator's input.
  *
  * Attribute references are names of columns at the current operator level
  * (nested values are reached by flattening first, as in the paper's
  * algebra). Arithmetic covers the derived columns used by the TPC-H
  * scenarios (e.g. ``disc_price <- l_extendedprice * (1 - l_discount)``).
  */
sealed trait Expr {
  /** All attribute names referenced by this expression. */
  def attrs: Set[String] = this match {
    case Attr(n)         => Set(n)
    case Lit(_)          => Set.empty
    case Arith(_, l, r)  => l.attrs ++ r.attrs
  }

  /** Rewrite attribute references (used by schema-alternative substitution). */
  def mapAttrs(f: String => String): Expr = this match {
    case Attr(n)        => Attr(f(n))
    case l: Lit         => l
    case Arith(o, a, b) => Arith(o, a.mapAttrs(f), b.mapAttrs(f))
  }

  /** Compile to a Catalyst column, resolving attributes through ``resolve``. */
  def toColumn(resolve: String => Column): Column = this match {
    case Attr(n)  => resolve(n)
    case Lit(v)   => lit(v)
    case Arith(op, l, r) =>
      val (a, b) = (l.toColumn(resolve), r.toColumn(resolve))
      op match {
        case "+" => a + b
        case "-" => a - b
        case "*" => a * b
        case "/" => a / b
        case other => throw new IllegalArgumentException(s"unknown arith op: $other")
      }
  }
}

/** Reference to an attribute of the operator's input. */
final case class Attr(name: String) extends Expr

/** A literal constant. */
final case class Lit(value: Any) extends Expr

/** Binary arithmetic (+, -, *, /). */
final case class Arith(op: String, l: Expr, r: Expr) extends Expr

/** Selection / join conditions: comparisons, conjunction, disjunction,
  * negation, null tests and substring containment (the paper's DBLP and
  * Twitter scenarios filter with ``contains``).
  */
sealed trait Pred {
  def attrs: Set[String] = this match {
    case Cmp(_, l, r)    => l.attrs ++ r.attrs
    case And(l, r)       => l.attrs ++ r.attrs
    case Or(l, r)        => l.attrs ++ r.attrs
    case Not(p)          => p.attrs
    case Contains(e, _)  => e.attrs
    case IsNull(e)       => e.attrs
    case IsNotNull(e)    => e.attrs
    case PTrue           => Set.empty
  }

  def mapAttrs(f: String => String): Pred = this match {
    case Cmp(o, l, r)   => Cmp(o, l.mapAttrs(f), r.mapAttrs(f))
    case And(l, r)      => And(l.mapAttrs(f), r.mapAttrs(f))
    case Or(l, r)       => Or(l.mapAttrs(f), r.mapAttrs(f))
    case Not(p)         => Not(p.mapAttrs(f))
    case Contains(e, s) => Contains(e.mapAttrs(f), s)
    case IsNull(e)      => IsNull(e.mapAttrs(f))
    case IsNotNull(e)   => IsNotNull(e.mapAttrs(f))
    case PTrue          => PTrue
  }

  def toColumn(resolve: String => Column): Column = this match {
    case Cmp(op, l, r) =>
      val (a, b) = (l.toColumn(resolve), r.toColumn(resolve))
      op match {
        case "="  => a === b
        case "!=" => a =!= b
        case ">"  => a > b
        case ">=" => a >= b
        case "<"  => a < b
        case "<=" => a <= b
        case other => throw new IllegalArgumentException(s"unknown cmp op: $other")
      }
    case And(l, r)      => l.toColumn(resolve) && r.toColumn(resolve)
    case Or(l, r)       => l.toColumn(resolve) || r.toColumn(resolve)
    case Not(p)         => !p.toColumn(resolve)
    case Contains(e, s) => e.toColumn(resolve).contains(s)
    case IsNull(e)      => e.toColumn(resolve).isNull
    case IsNotNull(e)   => e.toColumn(resolve).isNotNull
    case PTrue          => lit(true)
  }

  def &&(other: Pred): Pred = And(this, other)
  def ||(other: Pred): Pred = Or(this, other)
}

/** Comparison ``l op r`` with op in =, !=, >, >=, <, <=. */
final case class Cmp(op: String, l: Expr, r: Expr) extends Pred
final case class And(l: Pred, r: Pred) extends Pred
final case class Or(l: Pred, r: Pred) extends Pred
final case class Not(p: Pred) extends Pred
final case class Contains(e: Expr, needle: String) extends Pred
final case class IsNull(e: Expr) extends Pred
final case class IsNotNull(e: Expr) extends Pred
case object PTrue extends Pred

object Pred {
  /** ``attr = const`` shorthand. */
  def eq(attr: String, v: Any): Pred = Cmp("=", Attr(attr), Lit(v))
  def ne(attr: String, v: Any): Pred = Cmp("!=", Attr(attr), Lit(v))
  def gt(attr: String, v: Any): Pred = Cmp(">", Attr(attr), Lit(v))
  def ge(attr: String, v: Any): Pred = Cmp(">=", Attr(attr), Lit(v))
  def lt(attr: String, v: Any): Pred = Cmp("<", Attr(attr), Lit(v))
  def le(attr: String, v: Any): Pred = Cmp("<=", Attr(attr), Lit(v))
}
