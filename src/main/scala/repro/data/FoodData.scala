package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import scala.util.Random

/** Synthetic Food Inspection dataset (paper: 200K tuples, 17 attributes,
  * 10 golden DCs). Four inspections per licensed facility; facility-level
  * facts (names, type, risk, address, coordinates) are functions of the
  * license, geography is a function of the zip, and the inspection id is a
  * key.
  */
object FoodData extends BenchDataset {
  val name = "Food"
  val paperTuples = "200K"
  val paperAttrs = 17
  val defaultRows = 1500

  val schema: StructType = StructType(Seq(
    StructField("license", StringType), StructField("dbaname", StringType),
    StructField("akaname", StringType), StructField("facilitytype", StringType),
    StructField("risk", StringType), StructField("address", StringType),
    StructField("city", StringType), StructField("state", StringType),
    StructField("zip", StringType), StructField("inspectionid", StringType),
    StructField("inspectiondate", IntegerType), StructField("inspectiontype", StringType),
    StructField("results", StringType), StructField("latitude", DoubleType),
    StructField("longitude", DoubleType), StructField("ward", StringType),
    StructField("violations", DoubleType),
  ))

  private val itypes = Vector("Canvass", "Complaint", "License")
  private val res = Vector("Pass", "Fail", "PassCond")

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val licIdx = i / 4
      val zipIdx = licIdx % 60
      Row(
        f"LC$licIdx%04d", "DB" + licIdx, "AK" + licIdx,
        "FT" + (licIdx % 6), "RK" + (licIdx % 3), "AD" + licIdx,
        "FC" + (zipIdx >> 1), "FS" + (zipIdx % 6), f"FZ$zipIdx%02d",
        f"IN$i%05d",
        20150101 + rnd.nextInt(1000), itypes(rnd.nextInt(3)), res(rnd.nextInt(3)),
        41.0 + (licIdx % 100) * 0.01,
        -88.0 + (licIdx % 100) * 0.01,
        "WD" + rnd.nextInt(50),
        rnd.nextInt(20).toDouble,
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.fd(Seq("zip"), "state"),
    GoldenDc.fd(Seq("zip"), "city"),
    GoldenDc.fd(Seq("license"), "dbaname"),
    GoldenDc.fd(Seq("license"), "akaname"),
    GoldenDc.fd(Seq("license"), "facilitytype"),
    GoldenDc.fd(Seq("license"), "risk"),
    GoldenDc.fd(Seq("license"), "address"),
    GoldenDc.fd(Seq("address"), "latitude"),
    GoldenDc.fd(Seq("address"), "longitude"),
    GoldenDc.key(Seq("inspectionid")),
  )
}
