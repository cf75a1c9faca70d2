package repro.core

import repro.{Fixtures, SparkSpec}

class EncodedRelationSpec extends SparkSpec {

  private lazy val df = Fixtures.runningExample(spark)
  private lazy val rel = EncodedRelation.fromDataFrame(df)

  test("row and column counts survive encoding") {
    assert(rel.n == 15)
    assert(rel.cols.length == 5)
    assert(rel.names.toSeq == Seq("name", "state", "zip", "income", "tax"))
    assert(rel.isNumeric.toSeq == Seq(false, false, false, true, true))
  }

  test("numeric comparisons reflect the raw data") {
    val inc = 3
    // t2 income 42 vs t5 income 26
    assert(rel.cmp(inc, 1, inc, 4) > 0)
    assert(rel.cmp(inc, 4, inc, 1) < 0)
    // t4 and t11 both 58
    assert(rel.cmp(inc, 3, inc, 10) == 0)
  }

  test("string equality via shared dictionary") {
    val name = 0
    // t1 and t5 are both Alice
    assert(rel.cmp(name, 0, name, 4) == 0)
    assert(rel.cmp(name, 0, name, 1) != 0)
  }

  test("cross-column string codes come from one dictionary") {
    // state NY vs zip "11803" must not collide: different strings, different codes
    assert(rel.cmp(1, 0, 2, 0) != 0)
  }

  test("predicate evaluation matches manual semantics") {
    val inc = 3; val tax = 4; val state = 1
    val pGt = Predicate.normalized(ColRef(0, inc), ColRef(1, inc), Op.Gt)
    assert(rel.eval(pGt, 1, 4))   // (t2, t5): 42 > 26
    assert(!rel.eval(pGt, 4, 1))  // (t5, t2)
    val pStEq = Predicate.normalized(ColRef(0, state), ColRef(1, state), Op.Eq)
    assert(rel.eval(pStEq, 0, 1))   // NY, NY
    assert(!rel.eval(pStEq, 0, 5))  // NY, WA
    val pIncTax = Predicate.normalized(ColRef(0, inc), ColRef(1, tax), Op.Gt)
    assert(rel.eval(pIncTax, 1, 4)) // 42 > 2.1
    assert(rel.eval(pIncTax, 4, 1)) // 26 > 4.7
    val pSame = Predicate.normalized(ColRef(0, inc), ColRef(0, tax), Op.Gt)
    assert(rel.eval(pSame, 2, 0))   // income 93 > tax 11.8 on t3 regardless of j
  }

  test("exactly one of predicate/complement holds for every pair") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.0)
    for (i <- 0 until rel.n; j <- 0 until rel.n if i != j; p <- space.predicates)
      assert(rel.eval(p, i, j) != rel.eval(p.complement, i, j), s"$p on ($i,$j)")
  }

  test("mixed-type comparison is rejected") {
    intercept[IllegalArgumentException](rel.cmp(0, 0, 3, 0))
  }

  test("dates and booleans encode as numerics") {
    import org.apache.spark.sql.types._
    import org.apache.spark.sql.Row
    import scala.jdk.CollectionConverters._
    val schema = StructType(Seq(
      StructField("d", DateType), StructField("b", BooleanType),
      StructField("i", IntegerType)))
    val rows = Seq(
      Row(java.sql.Date.valueOf("2020-01-01"), true, 5),
      Row(java.sql.Date.valueOf("2020-01-02"), false, 7))
    val rel2 = EncodedRelation.fromDataFrame(spark.createDataFrame(rows.asJava, schema))
    assert(rel2.isNumeric.forall(identity))
    assert(rel2.cmp(0, 0, 0, 1) < 0)
    assert(rel2.cmp(1, 0, 1, 1) > 0)
    assert(rel2.cmp(2, 0, 2, 1) < 0)
  }

  test("nulls encode without breaking complement totality") {
    import org.apache.spark.sql.types._
    import org.apache.spark.sql.Row
    import scala.jdk.CollectionConverters._
    val schema = StructType(Seq(
      StructField("x", DoubleType), StructField("s", StringType)))
    val rows = Seq(Row(1.0, "a"), Row(null, null), Row(2.0, "a"))
    val df2 = spark.createDataFrame(rows.asJava, schema)
    val rel2 = EncodedRelation.fromDataFrame(df2)
    for (i <- 0 until 3; j <- 0 until 3 if i != j; op <- Op.all) {
      val p = Predicate.normalized(ColRef(0, 0), ColRef(1, 0), op)
      assert(rel2.eval(p, i, j) != rel2.eval(p.complement, i, j))
    }
  }
}
