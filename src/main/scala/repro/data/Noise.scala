package repro.data

import org.apache.spark.sql.{DataFrame, Row}
import scala.jdk.CollectionConverters._
import scala.util.Random

/** The two noise models of Sec. 8.4. A modified value has a 50% chance of
  * being swapped for another value from the column's active domain and a 50%
  * chance of becoming a typo (string: one character mutated; numeric: a
  * decimal-shift error).
  *
  *  - [[spread]]: every cell is modified independently with probability
  *    `cellProb` (paper: 0.001) — errors scattered across tuples.
  *  - [[skewed]]: only a `tupleProb` fraction of tuples (paper: 0.001) may
  *    change, and inside those each cell flips with probability `cellProb`
  *    — errors concentrated in a few heavily-corrupted tuples.
  */
object Noise {

  private def typo(v: Any, rnd: Random): Any = v match {
    case s: String if s.nonEmpty =>
      val i = rnd.nextInt(s.length)
      val ch = ('a' + rnd.nextInt(26)).toChar
      s.updated(i, if (s(i) == ch) (ch + 1).toChar else ch)
    case s: String => s + "x"
    case d: java.lang.Double =>
      if (rnd.nextBoolean()) d * 10.0 + rnd.nextInt(10) else math.floor(d / 10.0)
    case n: java.lang.Integer =>
      if (rnd.nextBoolean()) n * 10 + rnd.nextInt(10) else n / 10
    case other => other
  }

  private def domainSwap(v: Any, domain: IndexedSeq[Any], rnd: Random): Any = {
    if (domain.size <= 1) return typo(v, rnd)
    var pick = domain(rnd.nextInt(domain.size))
    var tries = 0
    while (pick == v && tries < 8) { pick = domain(rnd.nextInt(domain.size)); tries += 1 }
    pick
  }

  private def corrupt(v: Any, domain: IndexedSeq[Any], rnd: Random): Any =
    if (rnd.nextBoolean()) domainSwap(v, domain, rnd) else typo(v, rnd)

  private def withNoise(df: DataFrame, seed: Long)(
      cellFlips: (Random, Int) => Array[Boolean]): DataFrame = {
    val schema = df.schema
    val rows = df.collect()
    val k = schema.size
    val domains: Array[IndexedSeq[Any]] =
      (0 until k).map(c => rows.map(_.get(c)).distinct.toIndexedSeq).toArray
    val rnd = new Random(seed)
    val out = rows.map { r =>
      val flips = cellFlips(rnd, k)
      if (!flips.exists(identity)) r
      else {
        val vals = (0 until k).map { c =>
          if (flips(c)) corrupt(r.get(c), domains(c), rnd) else r.get(c)
        }
        Row.fromSeq(vals)
      }
    }
    df.sparkSession.createDataFrame(out.toSeq.asJava, schema)
  }

  /** Spread noise: each cell modified independently with `cellProb`. */
  def spread(df: DataFrame, cellProb: Double = 0.001, seed: Long = 11L): DataFrame =
    withNoise(df, seed)((rnd, k) => Array.fill(k)(rnd.nextDouble() < cellProb))

  /** Skewed noise: only `tupleProb` of the tuples change; within a chosen
    * tuple each cell flips with `cellProb` (errors concentrated).
    */
  def skewed(df: DataFrame, tupleProb: Double = 0.001, cellProb: Double = 0.5,
             seed: Long = 13L): DataFrame =
    withNoise(df, seed) { (rnd, k) =>
      if (rnd.nextDouble() < tupleProb) Array.fill(k)(rnd.nextDouble() < cellProb)
      else new Array[Boolean](k)
    }
}
