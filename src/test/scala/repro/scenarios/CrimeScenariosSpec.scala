package repro.scenarios

import repro.SparkSpec
import repro.data.Crime
import repro.nrab.Eval

/** Reproduces the §6.4 crime-scenario comparison of Why-Not, Conseil and
  * the reparameterization approach (paper Table 6 + accompanying text).
  */
class CrimeScenariosSpec extends SparkSpec {
  private lazy val t = Crime.tables(spark)

  private def check(s: Scenario): Unit = {
    val r = s.runAll()
    assert(r.rp == s.expectedRp, s"${s.name} RP: ${r.rp}")
    assert(r.rpNoSa == s.expectedRpNoSa, s"${s.name} RPnoSA: ${r.rpNoSa}")
    assert(s.runWhyNot() == s.expectedWhyNot, s"${s.name} Why-Not: ${s.runWhyNot()}")
    assert(s.runConseil() == s.expectedConseil, s"${s.name} Conseil: ${s.runConseil()}")
  }

  test("C1: Why-Not {σ1}, Conseil and ours {σ1,⋈2}") { check(CrimeScenarios.c1(t)) }
  test("C2: both baselines {σ4}, ours adds {σ3,σ4}") { check(CrimeScenarios.c2(t)) }
  test("C3: baselines blame the join, ours finds {π6} via the SA") {
    check(CrimeScenarios.c3(t))
  }

  test("C1: Roger is absent from the original result") {
    val s = CrimeScenarios.c1(t)
    assert(Eval(s.question.query, t).filter("name = 'Roger'").count() == 0)
  }

  test("C2: Conedera is absent from the original result") {
    val s = CrimeScenarios.c2(t)
    assert(Eval(s.question.query, t).filter("name = 'Conedera'").count() == 0)
  }

  test("C3: (Ashishbakshi, snow) is absent from the original result") {
    val s = CrimeScenarios.c3(t)
    assert(Eval(s.question.query, t)
      .filter("name = 'Ashishbakshi' and desc = 'snow'").count() == 0)
  }

  test("C1-C3 original queries return non-empty results") {
    CrimeScenarios.all(t).foreach { s =>
      assert(Eval(s.question.query, t).count() > 0, s"${s.name} original result empty")
    }
  }

  test("C3: ours never blames the join (no cross-product reparameterization)") {
    val s = CrimeScenarios.c3(t)
    assert(!s.runRp().exists(_.ops.contains(5)))
  }
}
