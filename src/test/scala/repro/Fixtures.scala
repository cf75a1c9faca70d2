package repro

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import scala.jdk.CollectionConverters._

/** Shared test fixtures, foremost the paper's running example (Table 1). */
object Fixtures {

  /** Table 1 of the paper: Name, State, Zip, Income, Tax for t1..t15.
    * Income/Tax are stored in thousands (28K -> 28.0) as doubles.
    */
  val runningExampleSchema: StructType = StructType(Seq(
    StructField("name", StringType), StructField("state", StringType),
    StructField("zip", StringType), StructField("income", DoubleType),
    StructField("tax", DoubleType),
  ))

  val runningExampleRows: Seq[Row] = Seq(
    Row("Alice", "NY", "11803", 28.0, 2.4),
    Row("Mark", "NY", "10102", 42.0, 4.7),
    Row("Bob", "NY", "13914", 93.0, 11.8),
    Row("Mary", "NY", "10437", 58.0, 6.7),
    Row("Alice", "NY", "10437", 26.0, 2.1),
    Row("Julia", "WA", "98112", 27.0, 1.4),
    Row("Jimmy", "WA", "98112", 24.0, 1.6),
    Row("Sam", "WA", "98112", 49.0, 6.8),
    Row("Jeff", "WA", "98112", 56.0, 7.8),
    Row("Gary", "WA", "98112", 50.0, 7.2),
    Row("Ron", "WA", "98112", 58.0, 8.0),
    Row("Jennifer", "WA", "98112", 61.0, 8.5),
    Row("Adam", "WA", "98112", 20.0, 1.0),
    Row("Tim", "IL", "62078", 39.0, 5.0),
    Row("Sarah", "IL", "98112", 54.0, 5.0),
  )

  def runningExample(spark: SparkSession): DataFrame =
    spark.createDataFrame(runningExampleRows.asJava, runningExampleSchema)

  /** A tiny generic relation for differential tests: mixed types, repeated
    * values, deterministic in (n, seed).
    */
  def smallMixed(spark: SparkSession, n: Int = 40, seed: Long = 3L): DataFrame = {
    val rnd = new scala.util.Random(seed)
    val rows = (0 until n).map { i =>
      Row("G" + rnd.nextInt(4), "H" + rnd.nextInt(3),
        rnd.nextInt(6).toDouble, rnd.nextInt(6).toDouble, (i % 5).toDouble)
    }
    val schema = StructType(Seq(
      StructField("g", StringType), StructField("h", StringType),
      StructField("x", DoubleType), StructField("y", DoubleType),
      StructField("z", DoubleType)))
    spark.createDataFrame(rows.asJava, schema)
  }
}
