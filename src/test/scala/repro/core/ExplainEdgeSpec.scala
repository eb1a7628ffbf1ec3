package repro.core

import repro.SparkSpec
import repro.data.Person
import repro.nrab._
import repro.whynot._

/** Edge-case behaviour of the explanation pipeline. */
class ExplainEdgeSpec extends SparkSpec {

  private def query: Op =
    NestRel(4, Seq("name"), "nList",
      Projection(3, ProjCol.keep("name", "city"),
        Selection(2, Pred.ge("year", 2019),
          FlattenRel(1, "address2", outer = false, TableAccess(0, "person")))))

  private def q(nip: NTup, groups: Seq[AltGroup] = Seq.empty) =
    Question(query, Map("person" -> Person.table(spark)), nip, groups)

  test("an answer present in the result never yields the empty explanation") {
    // LA is in the result: the only SA1 witness has an empty failure set,
    // which Alg. 4 drops (SR = ∅ is never an explanation)
    val es = Explain.rpNoSA(q(Nip.tup("city" -> NConst("LA"), "nList" -> NAny)))
    assert(!es.exists(_.ops.isEmpty))
  }

  test("an unsatisfiable why-not question yields no explanations") {
    val es = Explain.rp(
      q(Nip.tup("city" -> NConst("Atlantis"), "nList" -> NAny),
        Seq(AltGroup(Seq("person.address2", "person.address1")))))
    assert(es.isEmpty)
  }

  test("unconstrained why-not tuples make every failing row a witness") {
    val es = Explain.rpNoSA(q(Nip.tup("city" -> NAny, "nList" -> NAny)))
    assert(es.map(_.ops) == Seq(Set(2))) // some row always fails year >= 2019
  }

  test("witness counts accumulate per explanation") {
    val es = Explain.rpNoSA(q(Nip.tup("city" -> NAny, "nList" -> NAny)))
    assert(es.head.witnesses == 3) // Peter LA/SF + Sue NY fail the selection
  }

  test("duplicate explanations across alternatives are deduplicated") {
    val es = Explain.rp(
      q(Nip.tup("city" -> NConst("NY"), "nList" -> NAny),
        Seq(AltGroup(Seq("person.address2", "person.address1")))))
    assert(es.map(_.ops).distinct.size == es.size)
  }

  test("tracing through a union is rejected explicitly") {
    val u = UnionOp(5, query, query)
    intercept[UnsupportedOperationException] {
      Explain.rpNoSA(q(Nip.tup("city" -> NConst("NY"), "nList" -> NAny))
        .copy(query = u))
    }
  }

  test("an outer flatten is never blamed for pruning") {
    val qo = Projection(3, ProjCol.keep("name", "city"),
      Selection(2, Pred.ge("year", 2019),
        FlattenRel(1, "address2", outer = true, TableAccess(0, "person"))))
    val es = Explain.rpNoSA(Question(qo, Map("person" -> Person.table(spark)),
      Nip.tup("city" -> NConst("NY"), "name" -> NAny)))
    assert(es.map(_.ops) == Seq(Set(2)))
  }
}
