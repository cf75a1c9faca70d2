package repro.data

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import repro.core.Op
import scala.util.Random

/** Synthetic SP Stock dataset (paper: 123K tuples, 7 attributes, 6 golden
  * DCs). Prices are whole dollars so the four price columns share values and
  * pass the 30%-common-values rule — the golden DCs here are the classic
  * single-tuple order rules (high ≥ low etc.) plus the (date, ticker) key.
  */
object StockData extends BenchDataset {
  val name = "Stock"
  val paperTuples = "123K"
  val paperAttrs = 7
  val defaultRows = 1230

  val schema: StructType = StructType(Seq(
    StructField("tdate", IntegerType), StructField("ticker", StringType),
    StructField("open", DoubleType), StructField("high", DoubleType),
    StructField("low", DoubleType), StructField("close", DoubleType),
    StructField("volume", DoubleType),
  ))

  def rows(n: Int, seed: Long): Seq[Row] = {
    val rnd = new Random(seed)
    (0 until n).map { i =>
      val low = (10 + rnd.nextInt(90)).toDouble
      val spread = rnd.nextInt(6)
      Row(
        20100101 + i / 30,
        f"TK${i % 30}%02d",
        low + rnd.nextInt(spread + 1),
        low + spread,
        low,
        low + rnd.nextInt(spread + 1),
        (1000 + rnd.nextInt(100000)).toDouble,
      )
    }
  }

  val golden: Seq[GoldenDc] = Seq(
    GoldenDc.key(Seq("tdate", "ticker")),
    GoldenDc.singleTuple("high", Op.Lt, "low"),
    GoldenDc.singleTuple("open", Op.Gt, "high"),
    GoldenDc.singleTuple("open", Op.Lt, "low"),
    GoldenDc.singleTuple("close", Op.Gt, "high"),
    GoldenDc.singleTuple("close", Op.Lt, "low"),
  )
}
