package repro.scenarios

import repro.SparkSpec
import repro.data.Dblp
import repro.nrab.Eval

/** Reproduces paper Table 8's DBLP rows (D1–D5). */
class DblpScenariosSpec extends SparkSpec {
  private lazy val t = Dblp.tables(spark)

  private def check(s: Scenario): Unit = {
    val r = s.runAll()
    assert(r.wn == s.expectedWn, s"${s.name} WN++: ${r.wn}")
    assert(r.rpNoSa == s.expectedRpNoSa, s"${s.name} RPnoSA: ${r.rpNoSa}")
    assert(r.rp == s.expectedRp, s"${s.name} RP: ${r.rp}")
  }

  test("D1: explanations match Table 8") { check(DblpScenarios.d1(t)) }
  test("D2: explanations match Table 8") { check(DblpScenarios.d2(t)) }
  test("D3: explanations match Table 8") { check(DblpScenarios.d3(t)) }
  test("D4: explanations match Table 8") { check(DblpScenarios.d4(t)) }
  test("D5: explanations match Table 8 (documented deviation)") { check(DblpScenarios.d5(t)) }

  test("D1: the missing paper is absent from the original result") {
    val s = DblpScenarios.d1(t)
    assert(Eval(s.question.query, t)
      .filter(s"paptitle = '${Dblp.MissingPaper}'").count() == 0)
  }

  test("D2: Alice Smith has zero articles in the original result") {
    val s = DblpScenarios.d2(t)
    val rows = Eval(s.question.query, t).filter("aname = 'Alice Smith'").collect()
    assert(rows.length == 1 && rows.head.getLong(1) == 0L)
  }

  test("D3: Grace Liu never appears as a person in the original pairs") {
    val s = DblpScenarios.d3(t)
    val out = Eval(s.question.query, t)
      .selectExpr("explode(pairs) as p").filter("p.pair.person = 'Grace Liu'")
    assert(out.count() == 0)
  }

  test("D4: Bob Kumar is absent from the original result") {
    val s = DblpScenarios.d4(t)
    assert(Eval(s.question.query, t).filter("aname = 'Bob Kumar'").count() == 0)
  }

  test("D5: Carol Wu is absent from the original result") {
    val s = DblpScenarios.d5(t)
    assert(Eval(s.question.query, t).filter("aname = 'Carol Wu'").count() == 0)
  }

  test("D1-D5 original queries return non-empty results") {
    DblpScenarios.all(t).foreach { s =>
      assert(Eval(s.question.query, t).count() > 0, s"${s.name} original result empty")
    }
  }
}
