package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.StructType
import repro.core.{ColRef, DenialConstraint, Op, Predicate}
import scala.jdk.CollectionConverters._

/** One predicate of a golden DC, referencing attributes by name so golden
  * DCs are defined independently of any predicate-space indexing.
  */
final case class GoldenPred(colA: String, sideA: Int, op: Op, colB: String, sideB: Int)

/** A "golden" DC — the expert-provided ground truth of Table 4, used for the
  * G-recall experiments of Sec. 8.4.
  */
final case class GoldenDc(label: String, preds: Seq[GoldenPred]) {
  def resolve(schema: StructType): DenialConstraint =
    DenialConstraint(preds.map { p =>
      Predicate.normalized(
        ColRef(p.sideA, schema.fieldIndex(p.colA)),
        ColRef(p.sideB, schema.fieldIndex(p.colB)),
        p.op)
    }.toSet).canonical
}

object GoldenDc {
  /** FD-style golden DC: ¬(t.l1=t'.l1 ∧ … ∧ t.r≠t'.r). */
  def fd(lhs: Seq[String], rhs: String): GoldenDc =
    GoldenDc(s"${lhs.mkString(",")}->$rhs",
      lhs.map(c => GoldenPred(c, 0, Op.Eq, c, 1)) :+ GoldenPred(rhs, 0, Op.Neq, rhs, 1))

  /** Key golden DC: ¬(t.c1=t'.c1 ∧ … ∧ t.ck=t'.ck). */
  def key(cols: Seq[String]): GoldenDc =
    GoldenDc(s"key(${cols.mkString(",")})", cols.map(c => GoldenPred(c, 0, Op.Eq, c, 1)))

  /** Single-tuple order golden DC: ¬(t.a op t.b). */
  def singleTuple(a: String, op: Op, b: String): GoldenDc =
    GoldenDc(s"$a ${op.sym} $b", Seq(GoldenPred(a, 0, op, b, 0)))
}

/** A synthetic stand-in for one of the paper's evaluation datasets
  * (Table 4): same attribute count, same number of golden DCs, rows scaled
  * down (see DESIGN.md §3). Generation is deterministic in (rows, seed).
  */
trait BenchDataset {
  def name: String
  def paperTuples: String
  def paperAttrs: Int
  def defaultRows: Int
  def schema: StructType
  def golden: Seq[GoldenDc]

  /** Generate the raw rows on the driver (relation sizes are bounded by the
    * evidence builder's in-memory encoding; see EncodedRelation).
    */
  def rows(n: Int, seed: Long): Seq[Row]

  final def generate(spark: SparkSession, n: Int = defaultRows, seed: Long = 7L): DataFrame =
    spark.createDataFrame(rows(n, seed).asJava, schema)

  final def goldenDcs: Seq[DenialConstraint] = golden.map(_.resolve(schema))
}

/** Registry of the 8 evaluation datasets in Table 4's order. */
object Datasets {
  val all: Seq[BenchDataset] =
    Seq(TaxData, StockData, HospitalData, FoodData, AirportData, AdultData,
      FlightData, VoterData)

  def byName(n: String): BenchDataset =
    all.find(_.name.equalsIgnoreCase(n))
      .getOrElse(throw new IllegalArgumentException(s"unknown dataset: $n"))
}
