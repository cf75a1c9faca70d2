package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import scala.util.Random

/** Synthetic Airport dataset (paper: 55K tuples, 12 attributes, 9 golden
  * DCs). Each ident appears twice (two listings); ident-level facts are
  * functionally determined and the geography forms a containment chain
  * municipality → region → country → continent.
  */
object AirportData extends BenchDataset {
  val name = "Airport"
  val paperTuples = "55K"
  val paperAttrs = 12
  val defaultRows = 550

  val schema: StructType = StructType(Seq(
    StructField("id", StringType), StructField("ident", StringType),
    StructField("atype", StringType), StructField("aname", StringType),
    StructField("latitude", DoubleType), StructField("longitude", DoubleType),
    StructField("elevation", DoubleType), StructField("continent", StringType),
    StructField("country", StringType), StructField("region", StringType),
    StructField("municipality", StringType), StructField("gps", StringType),
  ))

  private val types = Vector("small", "medium", "large")

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val identIdx = i / 2
      val muniIdx = identIdx % 60
      val regIdx = muniIdx >> 1
      val countryIdx = regIdx / 3
      Row(
        f"AI$i%04d", f"ID$identIdx%03d",
        types(identIdx % 3), "AN" + identIdx,
        math.rint((rnd.nextDouble() * 180 - 90) * 100) / 100,
        math.rint((rnd.nextDouble() * 360 - 180) * 100) / 100,
        ((identIdx * 37) % 300 * 10).toDouble,
        "CT" + (countryIdx >> 1), "CO" + countryIdx, "RG" + regIdx,
        "MU" + muniIdx, "GP" + identIdx,
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.key(Seq("id")),
    GoldenDc.fd(Seq("ident"), "aname"),
    GoldenDc.fd(Seq("ident"), "gps"),
    GoldenDc.fd(Seq("gps"), "ident"),
    GoldenDc.fd(Seq("ident"), "atype"),
    GoldenDc.fd(Seq("ident"), "elevation"),
    GoldenDc.fd(Seq("municipality"), "region"),
    GoldenDc.fd(Seq("region"), "country"),
    GoldenDc.fd(Seq("country"), "continent"),
  )
}
