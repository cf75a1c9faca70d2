package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import repro.core.Op
import scala.util.Random

/** Synthetic NCVoter dataset (paper: 950K tuples, 25 attributes, 12 golden
  * DCs). Three unique identifiers (voterid, regnum, phone), a county-rooted
  * geography (county → state; zip/areacode/precinct/ward → county chain),
  * statusreason → status, and the age/birthyear order dependency.
  */
object VoterData extends BenchDataset {
  val name = "Voter"
  val paperTuples = "950K"
  val paperAttrs = 25
  val defaultRows = 2000

  val schema: StructType = StructType(Seq(
    StructField("voterid", StringType), StructField("regnum", StringType),
    StructField("lastname", StringType), StructField("firstname", StringType),
    StructField("midname", StringType), StructField("age", DoubleType),
    StructField("birthyear", DoubleType), StructField("gender", StringType),
    StructField("race", StringType), StructField("ethnic", StringType),
    StructField("street", StringType), StructField("city", StringType),
    StructField("state", StringType), StructField("zip", StringType),
    StructField("areacode", StringType), StructField("phone", StringType),
    StructField("county", StringType), StructField("countyid", StringType),
    StructField("precinct", StringType), StructField("party", StringType),
    StructField("regdate", IntegerType), StructField("status", StringType),
    StructField("statusreason", StringType), StructField("ward", StringType),
    StructField("district", StringType),
  ))

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val c = rnd.nextInt(24)
      val zipIdx = c * 4 + rnd.nextInt(4)
      val srIdx = rnd.nextInt(6)
      val age = (18 + rnd.nextInt(80)).toDouble
      Row(
        f"VI$i%05d", f"RN$i%05d",
        "LN" + rnd.nextInt(300), "FN" + rnd.nextInt(200), "MN" + rnd.nextInt(100),
        age, 2020.0 - age,
        if (rnd.nextBoolean()) "M" else "F",
        "RC" + rnd.nextInt(5), "ET" + rnd.nextInt(3),
        "SN" + rnd.nextInt(400),
        "VC" + zipIdx, "VS" + (c % 8), f"VZ$zipIdx%03d",
        "AC" + (c * 2 + rnd.nextInt(2)), f"VP$i%05d",
        "CN" + c, "CI" + c, "PR" + (c * 3 + rnd.nextInt(3)),
        "PT" + rnd.nextInt(3),
        19900101 + rnd.nextInt(10000),
        if (srIdx < 3) "A" else "I", "SR" + srIdx,
        "WD" + (zipIdx * 2 + rnd.nextInt(2)),
        "DS" + rnd.nextInt(10),
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.key(Seq("voterid")),
    GoldenDc.key(Seq("regnum")),
    GoldenDc.key(Seq("phone")),
    GoldenDc.fd(Seq("zip"), "city"),
    GoldenDc.fd(Seq("zip"), "state"),
    GoldenDc.fd(Seq("county"), "state"),
    GoldenDc.fd(Seq("countyid"), "county"),
    GoldenDc.fd(Seq("areacode"), "state"),
    GoldenDc.fd(Seq("precinct"), "county"),
    GoldenDc.fd(Seq("statusreason"), "status"),
    GoldenDc.fd(Seq("ward"), "city"),
    // older person ⇒ earlier birth year: age < age' ∧ birthyear < birthyear'
    // is impossible.
    GoldenDc("age↑⇒birthyear↓", Seq(
      GoldenPred("age", 0, Op.Lt, "age", 1),
      GoldenPred("birthyear", 0, Op.Lt, "birthyear", 1))),
  )
}
