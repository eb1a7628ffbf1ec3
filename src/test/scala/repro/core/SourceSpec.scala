package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.nrab._

/** Unit tests for column-source provenance and M_sbt (paper §5.1). */
class SourceSpec extends AnyFunSuite {

  NestedSchemas.register("w", "bag", Seq("f", "g"), "rel")
  NestedSchemas.register("w", "pair", Seq("p", "q"), "tup")
  private val ts = Map("w" -> Seq("c1", "c2", "bag", "pair"))

  test("table access maps columns to themselves") {
    val s = Source.colSources(TableAccess(0, "w"), ts)
    assert(s("c1") == SrcPath("w", List("c1")))
    assert(s("bag") == SrcPath("w", List("bag")))
  }

  test("projection rename preserves the source") {
    val q = Projection(1, Seq(ProjCol("x", Attr("c1"))), TableAccess(0, "w"))
    assert(Source.colSources(q, ts)("x") == SrcPath("w", List("c1")))
  }

  test("derived projection column becomes SrcDerived with its inputs") {
    val q = Projection(1, Seq(ProjCol("d", Arith("+", Attr("c1"), Attr("c2")))),
      TableAccess(0, "w"))
    val SrcDerived(1, "d", inputs) = Source.colSources(q, ts)("d"): @unchecked
    assert(inputs == Set(SrcPath("w", List("c1")), SrcPath("w", List("c2"))))
  }

  test("relation flatten extends the source path by the element field") {
    val q = FlattenRel(1, "bag", outer = false, TableAccess(0, "w"))
    val s = Source.colSources(q, ts)
    assert(s("f") == SrcPath("w", List("bag", "f")))
    assert(!s.contains("bag")) // relation flatten consumes the attribute
  }

  test("tuple flatten keeps the attribute and promotes fields") {
    val q = FlattenTup(1, "pair", TableAccess(0, "w"))
    val s = Source.colSources(q, ts)
    assert(s("p") == SrcPath("w", List("pair", "p")))
    assert(s.contains("pair"))
  }

  test("aggregation outputs are SrcAgg; keys keep their sources") {
    val q = Agg(1, Seq("k" -> "c1"), Seq(AggSpec("sum", "c2", "total")), TableAccess(0, "w"))
    val s = Source.colSources(q, ts)
    assert(s("k") == SrcPath("w", List("c1")))
    assert(s("total") == SrcAgg(1, "total"))
  }

  test("relation nesting produces SrcNested with per-field sources") {
    val q = NestRel(1, Seq("c2"), "packed", TableAccess(0, "w"))
    val SrcNested(1, fields) = Source.colSources(q, ts)("packed"): @unchecked
    assert(fields == Map("c2" -> SrcPath("w", List("c2"))))
  }

  test("tuple nesting respects output field aliases") {
    val q = NestTup(1, Seq("out1" -> "c1"), "packed", TableAccess(0, "w"))
    val SrcNested(1, fields) = Source.colSources(q, ts)("packed"): @unchecked
    assert(fields == Map("out1" -> SrcPath("w", List("c1"))))
  }

  test("join merges both sides' sources") {
    NestedSchemas.register("w2", "none", Seq.empty, "rel")
    val ts2 = ts + ("v" -> Seq("d1"))
    val q = Join(1, JoinKind.Inner, Seq("c1" -> "d1"),
      TableAccess(0, "w"), TableAccess(2, "v"))
    val s = Source.colSources(q, ts2)
    assert(s("c1") == SrcPath("w", List("c1")) && s("d1") == SrcPath("v", List("d1")))
  }

  test("opRefs resolves selection and flatten references (M_sbt, Ex. 12)") {
    val q = Selection(2, Pred.gt("f", 1),
      FlattenRel(1, "bag", outer = false, TableAccess(0, "w")))
    val refs = Source.opRefs(q, ts).toSet
    assert(refs.contains(2 -> SrcPath("w", List("bag", "f"))))
    assert(refs.contains(1 -> SrcPath("w", List("bag"))))
  }

  test("opRefs covers aggregation keys and aggregated expressions") {
    val q = Agg(1, Seq("k" -> "c1"),
      Seq(AggSpec("sum", Some(Arith("*", Attr("c2"), Lit(2))), "t")), TableAccess(0, "w"))
    val refs = Source.opRefs(q, ts).toSet
    assert(refs.contains(1 -> SrcPath("w", List("c1"))))
    assert(refs.contains(1 -> SrcPath("w", List("c2"))))
  }

  test("pathKey renders dotted paths") {
    assert(SrcPath("w", List("bag", "f")).pathKey.contains("w.bag.f"))
    assert(SrcAgg(1, "x").pathKey.isEmpty)
  }
}
