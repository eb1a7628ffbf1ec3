package repro.scenarios

import org.apache.spark.sql.SparkSession
import repro.data.{Crime, Dblp, NestedTpch, Twitter}

/** Harness for reproducing the paper's evaluation tables: builds every
  * scenario at a given scale, runs WN++ / RPnoSA / RP once, and renders
  * the rows of Table 7 (explanation counts + gold ranks) and Table 8
  * (explicit explanation sets) next to the paper's published values.
  */
object Tables {

  /** Paper Table 7: (scenario, #WN++, #RPnoSA, #RP, gold rank in RP). */
  val paperTable7: Seq[(String, Int, Int, Int, Option[Int])] = Seq(
    ("D1", 1, 1, 2, None), ("D2", 0, 0, 1, None), ("D3", 0, 0, 1, None),
    ("D4", 1, 2, 4, None), ("D5", 1, 1, 2, None),
    ("T1", 1, 1, 2, None), ("T2", 1, 2, 4, None), ("T3", 1, 1, 2, None),
    ("T4", 1, 1, 3, None), ("T_ASD", 0, 0, 2, Some(2)),
    ("Q1", 1, 1, 3, Some(2)), ("Q3", 1, 1, 2, Some(1)), ("Q4", 0, 0, 4, Some(3)),
    ("Q6", 1, 7, 11, Some(2)), ("Q10", 1, 2, 4, Some(4)), ("Q13", 1, 1, 1, Some(1)),
    ("Q1F", 1, 1, 3, Some(2)), ("Q3F", 1, 1, 2, Some(1)), ("Q4F", 0, 0, 4, Some(3)),
    ("Q6F", 1, 7, 11, Some(2)), ("Q10F", 1, 2, 4, Some(4)), ("Q13F", 1, 1, 1, Some(1)))

  /** Build all 25 scenarios (D, T, Q nested+flat, C) at the given scale.
    * ``tpchOrders`` drives the TPC-H size (2000 ≈ unit-test scale;
    * 20000+ ≈ bench scale).
    */
  def scenarios(spark: SparkSession, tpchOrders: Long = 2000,
                dblpRecords: Int = 400, tweets: Int = 300): Seq[Scenario] = {
    val tpch = NestedTpch(spark, nOrders = tpchOrders)
    val dblp = Dblp.tables(spark, nRecords = dblpRecords)
    val twitter = Twitter.tables(spark, nTweets = tweets)
    val crime = Crime.tables(spark)
    DblpScenarios.all(dblp) ++ TwitterScenarios.all(twitter) ++
      TpchScenarios.all(tpch) ++ CrimeScenarios.all(crime)
  }

  /** Scenarios of Table 7 (crime scenarios are compared separately). */
  def table7Scenarios(all: Seq[Scenario]): Seq[Scenario] =
    all.filterNot(_.name.startsWith("C"))

  /** Run all three approaches once per scenario. */
  def run(all: Seq[Scenario]): Map[String, ScenarioResult] =
    all.map(s => s.name -> s.runAll()).toMap

  def renderTable7(all: Seq[Scenario], results: Map[String, ScenarioResult]): String = {
    val paper = paperTable7.map(p => p._1 -> p).toMap
    val sb = new StringBuilder
    sb ++= "Table 7 — number of explanations per scenario: paper / measured\n"
    sb ++= f"${"Scen."}%-7s ${"WN++"}%-12s ${"RPnoSA"}%-12s ${"RP"}%-12s ${"gold rank"}%-12s\n"
    table7Scenarios(all).foreach { s =>
      val r = results(s.name)
      val (_, pw, pn, pr, pg) = paper(s.name)
      val gm = s.gold.flatMap(r.goldPosition)
      def cell(p: Int, m: Int) = f"${s"$p / $m"}%-12s"
      val gold = f"${s"${pg.map(_.toString).getOrElse("-")} / ${gm.map(_.toString).getOrElse("-")}"}%-12s"
      sb ++= f"${s.name}%-7s ${cell(pw, r.wn.size)} ${cell(pn, r.rpNoSa.size)} ${cell(pr, r.rp.size)} $gold\n"
    }
    sb.result()
  }

  def renderTable8(all: Seq[Scenario], results: Map[String, ScenarioResult]): String = {
    val sb = new StringBuilder
    sb ++= "Table 8 — explanation sets (measured; paper values in EXPERIMENTS.md)\n"
    table7Scenarios(all).foreach { s =>
      val r = results(s.name)
      def fmt(ss: Seq[Set[String]]) =
        if (ss.isEmpty) "∅" else ss.map(_.toSeq.sorted.mkString("{", ",", "}")).mkString(" ")
      sb ++= f"${s.name}%-7s WN++: ${fmt(r.wn)}\n"
      sb ++= f"${""}%-7s noSA: ${fmt(r.rpNoSa)}\n"
      sb ++= f"${""}%-7s RP:   ${fmt(r.rp)}\n"
      if (s.deviations.nonEmpty) sb ++= f"${""}%-7s note: ${s.deviations.mkString("; ")}\n"
    }
    sb.result()
  }

  /** §6.4 crime comparison rows: (scenario, Why-Not, Conseil, ours). */
  def crimeComparison(all: Seq[Scenario]): Seq[(String, String, String, String)] =
    all.filter(_.name.startsWith("C")).map { s =>
      def fmt(o: Option[Set[String]]) = o.map(_.toSeq.sorted.mkString("{", ",", "}")).getOrElse("∅")
      (s.name, fmt(s.runWhyNot()), fmt(s.runConseil()),
        s.runRp().map(_.labels.toSeq.sorted.mkString("{", ",", "}")).mkString(" "))
    }

  /** Operator SYMBOL (σ, ⋈, π, …) of an explanation label like "σ26". */
  def symbolOf(label: String): String = label.reverse.dropWhile(_.isDigit).reverse

  /** Table 3 operator-type sets per formalism over a scenario corpus. */
  def table3Symbols(results: Iterable[ScenarioResult]): (Set[String], Set[String]) = {
    val lineage = results.flatMap(_.wn.flatten).map(symbolOf).toSet
    val reparam = results.flatMap(_.rp.flatten).map(symbolOf).toSet
    (lineage, reparam)
  }
}
