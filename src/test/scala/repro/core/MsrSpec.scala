package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.nrab._

/** Unit tests for the explanation ranking (Def. 9 totalized, §5.4). */
class MsrSpec extends AnyFunSuite {

  // σ10(σ11(σ12(R))) — pre-order positions: 10 < 11 < 12
  private val q: Op =
    Selection(10, PTrue, Selection(11, PTrue, Selection(12, PTrue, TableAccess(0, "r"))))

  private def e(ops: Set[Int], sa: Int, w: Long = 1): Explanation =
    Explanation(ops, ops.map(Explain.labelOf(q, _)), sa, w)

  test("fewer operators rank first") {
    val ranked = Explain.rank(q, Seq(e(Set(10, 11), 0), e(Set(12), 0)))
    assert(ranked.map(_.ops) == Seq(Set(12), Set(10, 11)))
  }

  test("original-SA explanations rank before SA-based ones of equal size") {
    val ranked = Explain.rank(q, Seq(e(Set(11), 2), e(Set(12), 0)))
    assert(ranked.map(_.ops) == Seq(Set(12), Set(11)))
  }

  test("pipeline position breaks remaining ties (paper Q6 ordering)") {
    val ranked = Explain.rank(q,
      Seq(e(Set(11, 12), 0), e(Set(10, 12), 0), e(Set(10, 11), 0)))
    assert(ranked.map(_.ops) == Seq(Set(10, 11), Set(10, 12), Set(11, 12)))
  }

  test("full key: size dominates SA which dominates position") {
    val ranked = Explain.rank(q, Seq(
      e(Set(10, 11, 12), 0), e(Set(10), 1), e(Set(12), 0), e(Set(11, 12), 1)))
    assert(ranked.map(_.ops) ==
      Seq(Set(12), Set(10), Set(11, 12), Set(10, 11, 12)))
  }

  test("labels render the paper notation") {
    assert(e(Set(10), 0).labels == Set("σ10"))
    assert(e(Set(10, 11), 0).toString == "{σ10, σ11}")
  }

  test("labelOf falls back for unknown operators") {
    assert(Explain.labelOf(q, 999) == "op999")
  }
}
