package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import scala.util.Random

/** Synthetic Hospital dataset (paper: 115K tuples, 19 attributes, 7 golden
  * DCs). One row per (provider, measure code) pair; provider-level facts
  * (name, phone, location) and the per-(state, measure) state average are
  * functionally determined, as in the well-known Hospital cleaning dataset.
  */
object HospitalData extends BenchDataset {
  val name = "Hospital"
  val paperTuples = "115K"
  val paperAttrs = 19
  val defaultRows = 1152

  val schema: StructType = StructType(Seq(
    StructField("provider", StringType), StructField("hname", StringType),
    StructField("address", StringType), StructField("city", StringType),
    StructField("state", StringType), StructField("zip", StringType),
    StructField("county", StringType), StructField("phone", StringType),
    StructField("htype", StringType), StructField("owner", StringType),
    StructField("emergency", StringType), StructField("condition", StringType),
    StructField("mcode", StringType), StructField("mname", StringType),
    StructField("score", DoubleType), StructField("sample", DoubleType),
    StructField("stateavg", StringType), StructField("rating", DoubleType),
    StructField("beds", DoubleType),
  ))

  private val owners = Vector("Government", "Proprietary", "Voluntary", "Church", "District")
  private val types = Vector("Acute", "Critical", "Childrens")

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val pIdx = i / 12
      val mIdx = i % 12
      val zipIdx = pIdx % 80
      val stateIdx = zipIdx / 4
      Row(
        f"PV$pIdx%04d", "NM" + pIdx, "HA" + pIdx,
        "HC" + zipIdx, "HS" + stateIdx, f"HZ$zipIdx%03d", "HN" + (zipIdx / 2),
        "HP" + pIdx,
        types(pIdx % 3), owners(rnd.nextInt(owners.size)),
        if (rnd.nextBoolean()) "Yes" else "No",
        "CD" + rnd.nextInt(10),
        f"MC$mIdx%02d", "MN" + mIdx,
        rnd.nextInt(100).toDouble, rnd.nextInt(500).toDouble,
        "AV" + (stateIdx * 12 + mIdx),
        (1 + rnd.nextInt(5)).toDouble, (10 + rnd.nextInt(490)).toDouble,
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.fd(Seq("zip"), "state"),
    GoldenDc.fd(Seq("zip"), "city"),
    GoldenDc.fd(Seq("provider"), "hname"),
    GoldenDc.fd(Seq("provider"), "phone"),
    GoldenDc.fd(Seq("mcode"), "mname"),
    GoldenDc.fd(Seq("state", "mcode"), "stateavg"),
    GoldenDc.key(Seq("provider", "mcode")),
  )
}
