package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import scala.util.Random

/** Synthetic Adult (census) dataset (paper: 32K tuples, 15 attributes,
  * 3 golden DCs). The classic golden structure: education and
  * education-num are bijective, and relationship determines sex; everything
  * else is uncorrelated noise in the usual census domains.
  */
object AdultData extends BenchDataset {
  val name = "Adult"
  val paperTuples = "32K"
  val paperAttrs = 15
  val defaultRows = 800

  val schema: StructType = StructType(Seq(
    StructField("age", DoubleType), StructField("workclass", StringType),
    StructField("fnlwgt", DoubleType), StructField("education", StringType),
    StructField("educationnum", DoubleType), StructField("marital", StringType),
    StructField("occupation", StringType), StructField("relationship", StringType),
    StructField("race", StringType), StructField("sex", StringType),
    StructField("capitalgain", DoubleType), StructField("capitalloss", DoubleType),
    StructField("hoursperweek", DoubleType), StructField("nativecountry", StringType),
    StructField("income", StringType),
  ))

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { _ =>
      val edIdx = rnd.nextInt(16)
      val relIdx = rnd.nextInt(6)
      Row(
        (17 + rnd.nextInt(73)).toDouble,
        "WC" + rnd.nextInt(8),
        (100000 + rnd.nextInt(800000)).toDouble,
        f"ED$edIdx%02d",
        (edIdx + 1).toDouble,
        "MS" + rnd.nextInt(7),
        "OC" + rnd.nextInt(14),
        "RL" + relIdx,
        "RC" + rnd.nextInt(5),
        if (relIdx % 2 == 0) "Male" else "Female",
        (rnd.nextInt(50) * 100).toDouble,
        (rnd.nextInt(20) * 100).toDouble,
        (1 + rnd.nextInt(99)).toDouble,
        "NC" + rnd.nextInt(40),
        if (rnd.nextInt(4) == 0) ">50K" else "<=50K",
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.fd(Seq("education"), "educationnum"),
    GoldenDc.fd(Seq("educationnum"), "education"),
    GoldenDc.fd(Seq("relationship"), "sex"),
  )
}
