package repro.core

import repro.nrab._
import repro.whynot._

/** The result of schema backtracing (paper §5.1) for one (possibly
  * SA-substituted) query: the missing answer's constraints pushed to the
  * places where the tracer can check them.
  *
  *  - ``tableNips``: one NIP t̄_R per input table — a tuple pattern over
  *    the table's columns (nested constraints become bag/tuple patterns).
  *    Compatibility of a source tuple = it matches t̄_R.
  *  - ``flattenChecks``: per flatten operator, primitive constraints to
  *    re-validate on the promoted scalar columns — the paper's
  *    revalidation of compatibles after structure changes.
  *  - ``derivedChecks``: constraints on projection-derived columns,
  *    checked where the value is created.
  *  - ``aggChecks``: constraints on aggregate outputs, checked at the
  *    aggregation via subset-range satisfiability (paper §5.4's loose
  *    "full relaxation" bounds).
  */
final case class Placement(
    tableNips: Map[String, NTup],
    constrainedTables: Set[String],
    flattenChecks: Map[Int, Seq[(String, Nip)]],
    derivedChecks: Map[Int, Seq[(String, Nip)]],
    aggChecks: Map[Int, Seq[(String, Nip)]]) {

  /** t̄ for ``table`` (empty pattern — matches everything — if unconstrained). */
  def nipFor(table: String): NTup = tableNips.getOrElse(table, NTup(Seq.empty))
}

object Placement {

  /** Backtrace the why-not tuple ``nip`` (over ``query``'s output schema)
    * into a [[Placement]].
    */
  def backtrace(query: Op, nip: NTup,
                tableSchemas: Map[String, Seq[String]]): Placement = {
    val rootSources = Source.colSources(query, tableSchemas)

    val pathCons    = Seq.newBuilder[(SrcPath, Nip)]
    val aggCons     = Seq.newBuilder[(Int, (String, Nip))]
    val derivedCons = Seq.newBuilder[(Int, (String, Nip))]

    def place(src: SourceRef, n: Nip): Unit = n match {
      case NAny => ()
      case prim @ (NConst(_) | NCmp(_, _)) => src match {
        case p: SrcPath              => pathCons += p -> prim
        case SrcAgg(id, out)         => aggCons += id -> (out, prim)
        case SrcDerived(id, out, _)  => derivedCons += id -> (out, prim)
        case _: SrcNested            => () // primitive constraint on a nested value — unsupported
      }
      case NTup(fields) => src match {
        case SrcNested(_, fs) => fields.foreach { case (fn, s) => place(fs(fn), s) }
        case p: SrcPath       => fields.foreach { case (fn, s) => place(p.extend(fn), s) }
        case _                => ()
      }
      case NBag(elems, _) => elems.foreach {
        case NTup(fields) => src match {
          case SrcNested(_, fs) => fields.foreach { case (fn, s) => place(fs(fn), s) }
          case p: SrcPath       => fields.foreach { case (fn, s) => place(p.extend(fn), s) }
          case _                => ()
        }
        case NAny => () // existence of an element is witnessed by a consistent row
        case prim => src match {
          case p: SrcPath => pathCons += p -> prim
          case _          => ()
        }
      }
    }

    nip.fields.foreach { case (col, sub) =>
      rootSources.get(col) match {
        case Some(src) => place(src, sub)
        case None => throw new IllegalArgumentException(
          s"why-not attribute $col not in output schema ${rootSources.keys.toSeq.sorted}")
      }
    }

    val paths = pathCons.result()

    // t̄_R per table: nested pattern trees from the collected path constraints
    val tableNips = paths.groupBy(_._1.table).map { case (t, cs) =>
      t -> buildPattern(t, cs.map { case (p, n) => (p.path, n) })
    }

    // revalidation checks at flatten operators
    val fChecks = scala.collection.mutable.Map.empty[Int, Seq[(String, Nip)]]
    query.allOps.foreach {
      case f @ FlattenRel(id, attr, _, in, _) =>
        collectFlattenChecks(id, attr, in, Flattens.aliases(f, tableSchemas),
                             paths, tableSchemas, fChecks)
      case f @ FlattenTup(id, attr, in, _) =>
        collectFlattenChecks(id, attr, in, Flattens.aliases(f, tableSchemas),
                             paths, tableSchemas, fChecks)
      case _ => ()
    }

    Placement(
      tableNips = tableNips,
      constrainedTables = paths.map(_._1.table).toSet,
      flattenChecks = fChecks.toMap,
      derivedChecks = derivedCons.result().groupBy(_._1).map { case (k, v) => k -> v.map(_._2) },
      aggChecks = aggCons.result().groupBy(_._1).map { case (k, v) => k -> v.map(_._2) }
    )
  }

  private def collectFlattenChecks(
      id: Int, attr: String, in: Op, aliases: Seq[(String, String)],
      paths: Seq[(SrcPath, Nip)], tableSchemas: Map[String, Seq[String]],
      out: scala.collection.mutable.Map[Int, Seq[(String, Nip)]]): Unit = {
    val attrSrc = Source.colSources(in, tableSchemas).get(attr)
    attrSrc.foreach { s =>
      val checks = aliases.flatMap { case (o, field) =>
        Source.extendSource(s, field) match {
          case p: SrcPath => paths.collect { case (cp, n) if cp == p => (o, n) }
          case _          => Seq.empty
        }
      }
      if (checks.nonEmpty) out(id) = out.getOrElse(id, Seq.empty) ++ checks
    }
  }

  /** Build a nested NIP pattern for one table from (path, prim) pairs.
    * Scalar columns contribute direct fields; nested segments contribute
    * a struct pattern ("tup") or an exists-style bag pattern ("rel") —
    * constraints sharing a bag prefix land in the SAME element pattern
    * (a compatible element must satisfy them conjointly, cf. Example 7).
    */
  private[core] def buildPattern(table: String, cons: Seq[(List[String], Nip)]): NTup = {
    def build(level: Seq[(List[String], Nip)]): Seq[(String, Nip)] =
      level.groupBy(_._1.head).toSeq.sortBy(_._1).map { case (seg, cs) =>
        val (leaves, deeper) = cs.partition(_._1.size == 1)
        val leafNips = leaves.map(c => seg -> c._2)
        if (deeper.isEmpty) leafNips
        else {
          val inner = NTup(build(deeper.map { case (p, n) => (p.tail, n) }))
          val pat = NestedSchemas.kindOf(table, seg) match {
            case "tup" => inner: Nip
            case _     => NBag(Seq(inner), star = true): Nip
          }
          leafNips :+ (seg -> pat)
        }
      }.flatten
    NTup(build(cons))
  }
}
