package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.util.Random

/** Synthetic crime database for the paper's C1–C3 baseline comparison
  * (Table 6, §6.4): persons P, witnesses W, sightings S, crimes C, with
  * the named individuals the scenarios reference:
  *
  *  - Roger exists but without blue hair; the sighting matching his look
  *    was reported by a witness not recorded in W (C1)
  *  - Conedera was sighted by Luisa (sector 85) and Mario (sector 95),
  *    neither named Susan (C2)
  *  - Ashishbakshi was sighted twice: once with snow-white clothes by a
  *    recorded witness, once by an unrecorded one (C3)
  */
object Crime {
  final case class PersonRow(p_name: String, p_hair: String, p_clothes: String)
  final case class WitnessRow(w_name: String, w_sector: Int)
  final case class SightingRow(s_name: String, s_hair: String, s_clothes: String, s_witness: String)
  final case class CrimeRow(c_sector: Int, c_type: String)

  def tables(spark: SparkSession, seed: Long = 17): Map[String, DataFrame] = {
    import spark.implicits._
    val rnd = new Random(seed)
    val hairs = Seq("blue", "brown", "gray", "black", "red")
    val clothes = Seq("jacket", "coat", "hat", "scarf", "snow")

    val persons = Seq(
      PersonRow("Roger", "brown", "jacket"),
      PersonRow("Conedera", "red", "coat"),
      PersonRow("Bluey", "blue", "scarf"),
      PersonRow("Gandalf", "gray", "hat")) ++
      (1 to 30).map(i => PersonRow(s"P$i", hairs(rnd.nextInt(5)), clothes(rnd.nextInt(5))))

    val witnesses = Seq(
      WitnessRow("alice", 42), WitnessRow("Luisa", 85), WitnessRow("Mario", 95),
      WitnessRow("Susan", 95)) ++
      (1 to 15).map(i => WitnessRow(s"W$i", 10 + rnd.nextInt(90)))

    val sightings = Seq(
      // C1: matches Roger's look, but the witness is unknown
      SightingRow("roger-look", "brown", "jacket", "zack"),
      // C1 filler: the blue-haired person with a complete chain
      SightingRow("bluey-look", "blue", "scarf", "alice"),
      // C2: Conedera's look seen by Luisa and Mario
      SightingRow("conedera-look-1", "red", "coat", "Luisa"),
      SightingRow("conedera-look-2", "red", "coat", "Mario"),
      // C2 filler: Susan saw Gandalf's look
      SightingRow("gandalf-look", "gray", "hat", "Susan"),
      // C3: Ashishbakshi — snow clothes with a recorded witness, and a
      // second sighting by an unknown witness
      SightingRow("Ashishbakshi", "black", "snow", "alice"),
      SightingRow("Ashishbakshi", "brown", "jacket", "zack")) ++
      (1 to 20).map(i => SightingRow(s"S$i", hairs(rnd.nextInt(5)), clothes(rnd.nextInt(5)),
        if (rnd.nextBoolean()) "alice" else s"W${1 + rnd.nextInt(15)}"))
        // keep Roger's and Conedera's looks unique to the planted sightings
        .filterNot(s => (s.s_hair == "brown" && s.s_clothes == "jacket") ||
                        (s.s_hair == "red" && s.s_clothes == "coat"))

    val crimes = Seq(CrimeRow(42, "theft"), CrimeRow(85, "burglary"), CrimeRow(95, "fraud")) ++
      (1 to 20).map(_ => CrimeRow(10 + rnd.nextInt(90), Seq("theft", "fraud")(rnd.nextInt(2))))

    Map(
      "persons" -> persons.toDS().toDF().cache(),
      "witnesses" -> witnesses.toDS().toDF().cache(),
      "sightings" -> sightings.toDS().toDF().cache(),
      "crimes" -> crimes.toDS().toDF().cache())
  }
}
