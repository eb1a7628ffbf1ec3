package repro.nrab

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Evaluates an NRAB operator tree with its *original* semantics on Spark.
  *
  * Every operator compiles to DataFrame / Catalyst transformations
  * (explode for flatten, groupBy + collect_list for relation nesting,
  * struct for tuple nesting, …). Used to run scenario queries, to define
  * gold-standard results, and to compute side-effect estimates; the
  * instrumented (tracing) variant lives in [[repro.core.Trace]].
  */
object Eval {

  /** Evaluate ``op`` against ``catalog`` (table name -> DataFrame). */
  def apply(op: Op, catalog: Map[String, DataFrame]): DataFrame = {
    val tableSchemas = catalog.map { case (n, df) => n -> df.columns.toSeq }
    eval(op, catalog, tableSchemas)
  }

  private def eval(op: Op, catalog: Map[String, DataFrame],
                   tableSchemas: Map[String, Seq[String]]): DataFrame = op match {
    case TableAccess(_, name) =>
      catalog.getOrElse(name, throw new IllegalArgumentException(s"unknown table: $name"))

    case Projection(_, cols, in) =>
      val df = eval(in, catalog, tableSchemas)
      df.select(cols.map(c => c.expr.toColumn(df(_)).as(c.out)): _*)

    case Renaming(_, renames, in) =>
      val df = eval(in, catalog, tableSchemas)
      df.select(renames.map { case (nu, old) => df(old).as(nu) }: _*)

    case Selection(_, pred, in) =>
      val df = eval(in, catalog, tableSchemas)
      df.filter(pred.toColumn(df(_)))

    case Join(_, kind, conds, left, right) =>
      val (l, r) = (eval(left, catalog, tableSchemas), eval(right, catalog, tableSchemas))
      joinDisjoint(l, r, conds, JoinKind.spark(kind))

    case f @ FlattenRel(_, attr, outer, in, _) =>
      val df  = eval(in, catalog, tableSchemas)
      val gen = if (outer) explode_outer(df(attr)) else explode(df(attr))
      val keep = df.columns.filterNot(_ == attr).map(df(_))
      val promoted = Flattens.aliases(f, tableSchemas).map {
        case (out, field) => col("__x").getField(field).as(out)
      }
      df.select(keep :+ gen.as("__x"): _*).select(keep ++ promoted: _*)

    case f @ FlattenTup(_, attr, in, _) =>
      // tuple flatten keeps the flattened attribute (paper Table 1: R ∘ τ)
      val df = eval(in, catalog, tableSchemas)
      val keep = df.columns.map(df(_))
      val promoted = Flattens.aliases(f, tableSchemas).map {
        case (out, field) => df(attr).getField(field).as(out)
      }
      df.select(keep ++ promoted: _*)

    case NestRel(_, nested, out, in) =>
      val df   = eval(in, catalog, tableSchemas)
      val keys = df.columns.filterNot(nested.contains)
      val packed = struct(nested.map(n => df(n).as(n)): _*)
      df.groupBy(keys.map(df(_)): _*)
        .agg(collect_list(packed).as(out))

    case NestTup(_, fields, out, in) =>
      val df   = eval(in, catalog, tableSchemas)
      val attrs = fields.map(_._2)
      val keep = df.columns.filterNot(attrs.contains).map(df(_))
      df.select(keep :+ struct(fields.map { case (o, a) => df(a).as(o) }: _*).as(out): _*)

    case Agg(_, groupBy, aggs, in) =>
      val df = eval(in, catalog, tableSchemas)
      val exprs = aggs.map(a => aggColumn(a, df(_)))
      if (groupBy.isEmpty) df.agg(exprs.head, exprs.tail: _*)
      else df.groupBy(groupBy.map { case (o, a) => df(a).as(o) }: _*).agg(exprs.head, exprs.tail: _*)

    case UnionOp(_, l, r) =>
      eval(l, catalog, tableSchemas).unionByName(eval(r, catalog, tableSchemas))

    case Dedup(_, in) =>
      eval(in, catalog, tableSchemas).distinct()
  }

  /** Equi-join requiring disjoint column names across the two inputs (all
    * scenario schemas use prefixed names); keeps both sides' columns.
    */
  def joinDisjoint(l: DataFrame, r: DataFrame, conds: Seq[(String, String)],
                   sparkKind: String): DataFrame = {
    val overlap = l.columns.toSet.intersect(r.columns.toSet)
    require(overlap.isEmpty, s"join inputs must have disjoint columns, overlap: $overlap")
    val cond = conds.map { case (a, b) => l(a) === r(b) }.reduceOption(_ && _).getOrElse(lit(true))
    l.join(r, cond, sparkKind)
  }

  /** Compile one aggregate spec, resolving attributes through ``resolve``. */
  def aggColumn(a: AggSpec, resolve: String => Column): Column = {
    def v: Column = a.expr.get.toColumn(resolve)
    val c = a.func match {
      case "count" => a.expr.map(_ => count(v)).getOrElse(count(lit(1)))
      case "sum"   => sum(v)
      case "avg"   => avg(v)
      case "min"   => min(v)
      case "max"   => max(v)
      case "count_distinct" => countDistinct(v)
      case other   => throw new IllegalArgumentException(s"unknown aggregate: $other")
    }
    c.as(a.out)
  }

  /** Output column names of ``op`` (data-independent schema calculus used
    * by backtracing and schema-alternative pruning).
    */
  def schemaOf(op: Op, tableSchemas: Map[String, Seq[String]]): Seq[String] = op match {
    case TableAccess(_, name) =>
      tableSchemas.getOrElse(name, throw new IllegalArgumentException(s"unknown table: $name"))
    case Projection(_, cols, _)     => cols.map(_.out)
    case Renaming(_, renames, _)    => renames.map(_._1)
    case Selection(_, _, in)        => schemaOf(in, tableSchemas)
    case Join(_, _, _, l, r)        => schemaOf(l, tableSchemas) ++ schemaOf(r, tableSchemas)
    case f @ FlattenRel(_, attr, _, in, _) =>
      schemaOf(in, tableSchemas).filterNot(_ == attr) ++ Flattens.aliases(f, tableSchemas).map(_._1)
    case f @ FlattenTup(_, _, in, _) =>
      schemaOf(in, tableSchemas) ++ Flattens.aliases(f, tableSchemas).map(_._1)
    case NestRel(_, nested, out, in) =>
      schemaOf(in, tableSchemas).filterNot(nested.contains) :+ out
    case NestTup(_, fields, out, in) =>
      schemaOf(in, tableSchemas).filterNot(fields.map(_._2).contains) :+ out
    case Agg(_, groupBy, aggs, _)   => groupBy.map(_._1) ++ aggs.map(_.out)
    case UnionOp(_, l, _)           => schemaOf(l, tableSchemas)
    case Dedup(_, in)               => schemaOf(in, tableSchemas)
  }
}

/** Data-independent tracking of the *nested* structure (which attributes
  * are nested relations/tuples and what fields they hold), so backtracing
  * and SA pruning can run before touching data. Nested structure is
  * registered per (table, attribute-or-promoted-attribute) by the data
  * generators; attributes promoted by a tuple flatten keep their field
  * registration under the same table name.
  */
object NestedSchemas {
  private val reg = scala.collection.concurrent.TrieMap.empty[(String, String), Seq[String]]
  private val kinds = scala.collection.concurrent.TrieMap.empty[(String, String), String]

  /** Register nested attribute ``attr`` of ``table`` with its element
    * ``fields``; ``kind`` is "rel" (array of struct — a nested relation)
    * or "tup" (struct — a nested tuple). Attributes promoted by a tuple
    * flatten are registered under the same table name.
    */
  def register(table: String, attr: String, fields: Seq[String], kind: String = "rel"): Unit = {
    reg.put((table, attr), fields)
    kinds.put((table, attr), kind)
  }

  /** "rel" | "tup" for a registered nested attribute segment. */
  def kindOf(table: String, attr: String): String =
    kinds.getOrElse((table, attr),
      throw new IllegalArgumentException(s"nested kind of $table.$attr not registered"))

  /** Fields of nested attribute ``attr`` as produced by operator ``in``. */
  def fieldsOf(in: Op, attr: String, tableSchemas: Map[String, Seq[String]]): Seq[String] =
    in match {
      case TableAccess(_, name) =>
        reg.getOrElse((name, attr),
          throw new IllegalArgumentException(s"nested structure of $name.$attr not registered"))
      case NestRel(_, nested, out, _) if out == attr => nested
      case NestTup(_, fields, out, _) if out == attr => fields.map(_._1)
      case Projection(_, cols, child) =>
        val src = cols.find(_.out == attr).map(_.expr) match {
          case Some(Attr(n)) => n
          case _             => attr
        }
        fieldsOf(child, src, tableSchemas)
      case Renaming(_, renames, child) =>
        val src = renames.find(_._1 == attr).map(_._2).getOrElse(attr)
        fieldsOf(child, src, tableSchemas)
      case Selection(_, _, child)  => fieldsOf(child, attr, tableSchemas)
      case Dedup(_, child)         => fieldsOf(child, attr, tableSchemas)
      case UnionOp(_, l, _)        => fieldsOf(l, attr, tableSchemas)
      case Join(_, _, _, l, r) =>
        if (Eval.schemaOf(l, tableSchemas).contains(attr)) fieldsOf(l, attr, tableSchemas)
        else fieldsOf(r, attr, tableSchemas)
      case f @ FlattenRel(_, a, _, child, _) =>
        if (a == attr)
          throw new IllegalArgumentException(s"$attr was flattened away by ${f.label}")
        // attr may be a field promoted by this flatten (alias out == attr):
        // resolve via the table-level registry fallback by recursing.
        fieldsOf(child, promotedSource(f.aliases, attr), tableSchemas)
      case f @ FlattenTup(_, a, child, _) =>
        if (a == attr)
          throw new IllegalArgumentException(s"$attr was flattened away by ${f.label}")
        fieldsOf(child, promotedSource(f.aliases, attr), tableSchemas)
      case other =>
        throw new IllegalArgumentException(s"cannot resolve nested fields of $attr below ${other.label}")
    }

  private def promotedSource(aliases: Option[Seq[(String, String)]], attr: String): String =
    aliases.flatMap(_.find(_._1 == attr).map(_._2)).getOrElse(attr)

  def clear(): Unit = { reg.clear(); kinds.clear() }
}

/** Helpers around flatten field aliases. */
object Flattens {
  def aliases(f: FlattenRel, tableSchemas: Map[String, Seq[String]]): Seq[(String, String)] =
    f.aliases.getOrElse(
      NestedSchemas.fieldsOf(f.in, f.attr, tableSchemas).map(x => x -> x))

  def aliases(f: FlattenTup, tableSchemas: Map[String, Seq[String]]): Seq[(String, String)] =
    f.aliases.getOrElse(
      NestedSchemas.fieldsOf(f.in, f.attr, tableSchemas).map(x => x -> x))
}
