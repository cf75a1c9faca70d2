package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import scala.util.Random

/** Synthetic Flight dataset (paper: 582K tuples, 20 attributes, 13 golden
  * DCs). (flightno, date) is a key; the flight number determines carrier,
  * route and schedule; airports determine their city/state; distance is a
  * function of the route. The destination depends on the flight number
  * *beyond* origin (mixing fIdx/29 into the hash) so origin does not
  * accidentally determine dest and the route→distance DC stays minimal.
  */
object FlightData extends BenchDataset {
  val name = "Flight"
  val paperTuples = "582K"
  val paperAttrs = 20
  val defaultRows = 1500

  val schema: StructType = StructType(Seq(
    StructField("flightno", StringType), StructField("fdate", IntegerType),
    StructField("carrier", StringType), StructField("carriername", StringType),
    StructField("origin", StringType), StructField("origincity", StringType),
    StructField("originstate", StringType), StructField("dest", StringType),
    StructField("destcity", StringType), StructField("deststate", StringType),
    StructField("scheddep", DoubleType), StructField("schedarr", DoubleType),
    StructField("actdep", DoubleType), StructField("actarr", DoubleType),
    StructField("depdelay", DoubleType), StructField("arrdelay", DoubleType),
    StructField("gate", StringType), StructField("tailnum", StringType),
    StructField("distance", DoubleType), StructField("duration", DoubleType),
  ))

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val fIdx = i % 97
      val oIdx = (fIdx * 13) % 29
      val d0 = ((fIdx % 29) * 13 + (fIdx / 29) * 5 + 7) % 29
      val dIdx = if (d0 == oIdx) (d0 + 1) % 29 else d0
      val carrierIdx = fIdx % 7
      val scheddep = (360 + (fIdx * 35) % 900).toDouble
      val duration = (60 + (fIdx * 55) % 300).toDouble
      val delay = (rnd.nextInt(12) * 5).toDouble
      val pad = (rnd.nextInt(7) * 5).toDouble
      Row(
        f"FL$fIdx%02d", 20190101 + i / 97,
        "CR" + carrierIdx, "CN" + carrierIdx,
        "AP" + oIdx, "CY" + oIdx, "FS" + (oIdx % 11),
        "AP" + dIdx, "CY" + dIdx, "FS" + (dIdx % 11),
        scheddep, scheddep + duration,
        scheddep + delay, scheddep + delay + duration + pad,
        delay, delay + pad,
        "GT" + rnd.nextInt(40), "TN" + rnd.nextInt(200),
        ((oIdx * 29 + dIdx) % 500 * 10 + 100).toDouble,
        duration,
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.key(Seq("flightno", "fdate")),
    GoldenDc.fd(Seq("flightno"), "carrier"),
    GoldenDc.fd(Seq("carrier"), "carriername"),
    GoldenDc.fd(Seq("flightno"), "origin"),
    GoldenDc.fd(Seq("flightno"), "dest"),
    GoldenDc.fd(Seq("origin"), "origincity"),
    GoldenDc.fd(Seq("origin"), "originstate"),
    GoldenDc.fd(Seq("dest"), "destcity"),
    GoldenDc.fd(Seq("dest"), "deststate"),
    GoldenDc.fd(Seq("flightno"), "scheddep"),
    GoldenDc.fd(Seq("flightno"), "schedarr"),
    GoldenDc.fd(Seq("flightno"), "duration"),
    GoldenDc.fd(Seq("origin", "dest"), "distance"),
  )
}
