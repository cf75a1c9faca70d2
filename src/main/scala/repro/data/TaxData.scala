package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import repro.core.Op
import scala.util.Random

/** Synthetic Tax dataset (paper: 1M tuples, 15 attributes, 9 golden DCs).
  *
  * Planted structure: disjoint per-state zip/areacode/city geography, a
  * per-state strictly salary-monotone tax rate with large cross-state base
  * spread (so the state-free sub-DC is heavily violated and the golden order
  * DC stays minimal), and exemptions functionally determined by
  * (state, marital status / has-child).
  */
object TaxData extends BenchDataset {
  val name = "Tax"
  val paperTuples = "1M"
  val paperAttrs = 15
  val defaultRows = 3000

  val schema: StructType = StructType(Seq(
    StructField("fname", StringType), StructField("lname", StringType),
    StructField("gender", StringType), StructField("areacode", StringType),
    StructField("phone", StringType), StructField("city", StringType),
    StructField("state", StringType), StructField("zip", StringType),
    StructField("marital", StringType), StructField("haschild", StringType),
    StructField("salary", DoubleType), StructField("rate", DoubleType),
    StructField("singleexemp", DoubleType), StructField("marriedexemp", DoubleType),
    StructField("childexemp", DoubleType),
  ))

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val s = rnd.nextInt(20)
      val zipNum = s * 100 + rnd.nextInt(8)
      val marital = if (rnd.nextBoolean()) "M" else "S"
      val haschild = if (rnd.nextBoolean()) "Y" else "N"
      val salary = (10000 + rnd.nextInt(900) * 100).toDouble
      Row(
        "F" + rnd.nextInt(200), "L" + rnd.nextInt(300),
        if (rnd.nextBoolean()) "M" else "F",
        "A" + (s * 3 + rnd.nextInt(3)),
        f"P$i%06d",
        "C" + (zipNum >> 1),
        "TS" + s,
        f"Z$zipNum%04d",
        marital, haschild,
        salary,
        (s % 10) * 4.0 + salary * 2e-4,
        s * 10.0 + (if (marital == "S") 5.0 else 0.0),
        if (marital == "M") 1000.0 else 0.0,
        s * 5.0 + (if (haschild == "Y") 200.0 else 0.0),
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.fd(Seq("zip"), "state"),
    GoldenDc.fd(Seq("zip"), "city"),
    GoldenDc.fd(Seq("city"), "state"),
    GoldenDc.fd(Seq("areacode"), "state"),
    GoldenDc.key(Seq("phone")),
    // state = state' ∧ salary > salary' ∧ rate < rate' is impossible.
    GoldenDc("state,salary↑⇒rate↑", Seq(
      GoldenPred("state", 0, Op.Eq, "state", 1),
      GoldenPred("salary", 0, Op.Gt, "salary", 1),
      GoldenPred("rate", 0, Op.Lt, "rate", 1))),
    GoldenDc.fd(Seq("state", "marital"), "singleexemp"),
    GoldenDc.fd(Seq("marital"), "marriedexemp"),
    GoldenDc.fd(Seq("state", "haschild"), "childexemp"),
  )
}
