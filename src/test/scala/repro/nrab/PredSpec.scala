package repro.nrab

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for expression / predicate ASTs: attribute collection,
  * substitution, and the builders.
  */
class PredSpec extends AnyFunSuite {

  test("Expr.attrs collects all attribute references") {
    val e = Arith("*", Attr("a"), Arith("-", Lit(1), Attr("b")))
    assert(e.attrs == Set("a", "b"))
    assert(Lit(3).attrs.isEmpty)
  }

  test("Expr.mapAttrs rewrites references and keeps structure") {
    val e = Arith("+", Attr("a"), Attr("b"))
    assert(e.mapAttrs(n => n.toUpperCase) == Arith("+", Attr("A"), Attr("B")))
  }

  test("Pred.attrs collects across connectives") {
    val p = And(Pred.eq("a", 1), Or(Pred.gt("b", 2), Contains(Attr("c"), "x")))
    assert(p.attrs == Set("a", "b", "c"))
  }

  test("Pred.mapAttrs is structure-preserving") {
    val p = And(Pred.eq("a", 1), Not(IsNull(Attr("b"))))
    assert(p.mapAttrs(identity) == p)
    assert(p.mapAttrs(_ => "z").attrs == Set("z"))
  }

  test("builders produce the expected comparison shapes") {
    assert(Pred.eq("a", 1) == Cmp("=", Attr("a"), Lit(1)))
    assert(Pred.ne("a", 1) == Cmp("!=", Attr("a"), Lit(1)))
    assert(Pred.gt("a", 1) == Cmp(">", Attr("a"), Lit(1)))
    assert(Pred.ge("a", 1) == Cmp(">=", Attr("a"), Lit(1)))
    assert(Pred.lt("a", 1) == Cmp("<", Attr("a"), Lit(1)))
    assert(Pred.le("a", 1) == Cmp("<=", Attr("a"), Lit(1)))
  }

  test("&& and || combinators nest correctly") {
    val p = Pred.eq("a", 1) && (Pred.gt("b", 2) || PTrue)
    assert(p == And(Cmp("=", Attr("a"), Lit(1)), Or(Cmp(">", Attr("b"), Lit(2)), PTrue)))
  }

  test("unknown arithmetic operator is rejected at compile time") {
    val e = Arith("%", Attr("a"), Lit(2))
    intercept[IllegalArgumentException] {
      e.toColumn(_ => org.apache.spark.sql.functions.lit(1))
    }
  }

  test("unknown comparison operator is rejected at compile time") {
    val p = Cmp("~", Attr("a"), Lit(2))
    intercept[IllegalArgumentException] {
      p.toColumn(_ => org.apache.spark.sql.functions.lit(1))
    }
  }
}
