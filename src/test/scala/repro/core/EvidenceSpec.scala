package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.{lit, monotonically_increasing_id}
import repro.{Fixtures, Oracle, SparkSpec}

/** Evidence-set construction validated against the paper's running example
  * (Table 1, Examples 1.2 and 3.1) and the DuckDB oracle.
  */
class EvidenceSpec extends SparkSpec {

  private lazy val df = Fixtures.runningExample(spark)
  private lazy val space = PredicateSpace.build(df, overlapThreshold = 0.0)
  private lazy val rel = EncodedRelation.fromDataFrame(df)
  private lazy val ev = EvidenceBuilder.build(spark, rel, space, needVios = true)

  private def pred(ca: String, sa: Int, op: Op, cb: String, sb: Int): Int = {
    val a = space.colNames.indexOf(ca); val b = space.colNames.indexOf(cb)
    space.indexOf(Predicate.normalized(ColRef(sa, a), ColRef(sb, b), op))
  }

  /** Hitting-set indices (complement predicates) of a DC given as preds. */
  private def hs(preds: (String, Op, String)*): Set[Int] =
    preds.map { case (ca, op, cb) => pred(ca, 0, op.complement, cb, 1) }.toSet

  test("bag semantics: class counts sum to |D|(|D|-1) = 210") {
    assert(ev.totalPairs == 210)
    assert(ev.counts.sum == 210)
    assert(ev.nTuples == 15)
  }

  test("masks are distinct") {
    val keys = ev.masks.map(_.toSeq).toSeq
    assert(keys.distinct.size == keys.size)
  }

  test("Example 3.1: Sat(t2, t5) membership") {
    // Recompute the single-pair mask through the relation encoding and check
    // the exact predicates the example lists.
    def sat(i: Int, j: Int, p: Int): Boolean = rel.eval(space.predicates(p), i, j)
    val t2 = 1; val t5 = 4
    assert(sat(t2, t5, pred("name", 0, Op.Neq, "name", 1)))
    assert(sat(t2, t5, pred("income", 0, Op.Gt, "income", 1)))
    assert(sat(t2, t5, pred("income", 0, Op.Geq, "income", 1)))
    assert(sat(t2, t5, pred("income", 0, Op.Gt, "tax", 1)))
    assert(sat(t2, t5, pred("income", 0, Op.Geq, "tax", 1)))
    assert(!sat(t2, t5, pred("income", 0, Op.Lt, "income", 1)))
    // Reversed pair: order flips on income/income, not on name.
    assert(sat(t5, t2, pred("name", 0, Op.Neq, "name", 1)))
    assert(sat(t5, t2, pred("income", 0, Op.Lt, "income", 1)))
    assert(sat(t5, t2, pred("income", 0, Op.Leq, "income", 1)))
    assert(!sat(t5, t2, pred("income", 0, Op.Gt, "income", 1)))
    // 26 > 4.7: the income/tax cross predicate holds in this direction too.
    assert(sat(t5, t2, pred("income", 0, Op.Gt, "tax", 1)))
  }

  test("Example 1.2: phi1 is violated by exactly 2 of 210 pairs") {
    val hs1 = hs(("state", Op.Eq, "state"), ("income", Op.Gt, "income"),
      ("tax", Op.Leq, "tax"))
    assert(ev.violationsOf(hs1) == 2)
  }

  test("Example 1.2: phi2 is violated by exactly 16 of 210 pairs") {
    val hs2 = hs(("zip", Op.Eq, "zip"), ("state", Op.Neq, "state"))
    assert(ev.violationsOf(hs2) == 16)
  }

  test("f1 matches the example percentages") {
    val f1 = new F1(ev)
    val g1 = f1.g(ev.violatingClasses(hs(("state", Op.Eq, "state"),
      ("income", Op.Gt, "income"), ("tax", Op.Leq, "tax"))).iterator)
    assert(math.abs(g1 - 2.0 / 210) < 1e-12) // 0.95%
    val g2 = f1.g(ev.violatingClasses(hs(("zip", Op.Eq, "zip"),
      ("state", Op.Neq, "state"))).iterator)
    assert(math.abs(g2 - 16.0 / 210) < 1e-12) // 7.62%
  }

  test("f2: phi1 involves tuples t6,t7,t14,t15 -> g2 = 4/15") {
    val f2 = new F2(ev)
    val g = f2.g(ev.violatingClasses(hs(("state", Op.Eq, "state"),
      ("income", Op.Gt, "income"), ("tax", Op.Leq, "tax"))).iterator)
    assert(math.abs(g - 4.0 / 15) < 1e-12)
  }

  test("greedy f3 matches the example repairs: 2/15 for phi1, 1/15 for phi2") {
    val f3 = new GreedyF3(ev)
    val g1 = f3.g(ev.violatingClasses(hs(("state", Op.Eq, "state"),
      ("income", Op.Gt, "income"), ("tax", Op.Leq, "tax"))).iterator)
    assert(math.abs(g1 - 2.0 / 15) < 1e-12) // 13.3%
    val g2 = f3.g(ev.violatingClasses(hs(("zip", Op.Eq, "zip"),
      ("state", Op.Neq, "state"))).iterator)
    assert(math.abs(g2 - 1.0 / 15) < 1e-12) // 6.67%: remove t15 only
  }

  test("vios: per-class tuple counts sum to twice the pair count") {
    val vios = ev.vios.get
    ev.masks.indices.foreach { c =>
      val s = vios(c).map(Evidence.cntOf).sum
      assert(s == 2 * ev.counts(c), s"class $c")
    }
  }

  test("naive and fast builders produce identical evidence") {
    val naive = NaiveEvidenceBuilder.build(spark, rel, space)
    def canon(e: Evidence): Set[(Seq[Long], Long)] =
      e.masks.zip(e.counts).map { case (m, c) => (m.toSeq, c) }.toSet
    assert(canon(naive) == canon(ev))
  }

  test("builders agree on a random mixed relation too") {
    val df2 = Fixtures.smallMixed(spark, n = 35, seed = 9L)
    val space2 = PredicateSpace.build(df2, overlapThreshold = 0.0)
    val rel2 = EncodedRelation.fromDataFrame(df2)
    val fast = EvidenceBuilder.build(spark, rel2, space2)
    val naive = NaiveEvidenceBuilder.build(spark, rel2, space2)
    def canon(e: Evidence): Set[(Seq[Long], Long)] =
      e.masks.zip(e.counts).map { case (m, c) => (m.toSeq, c) }.toSet
    assert(canon(fast) == canon(naive))
    assert(fast.counts.sum == 35L * 34)
  }

  private def oracleViolationCount(data: DataFrame, hsIdx: Set[Int], sql: String): Unit = {
    import spark.implicits._
    val viol = ev.violationsOf(hsIdx)
    val sparkDf = Seq(viol).toDF("viol")
    Oracle.assertEquivalent(sparkDf, sql, "r" -> data.withColumn("rid", monotonically_increasing_id()))
  }

  test("oracle: phi1 violation count agrees with DuckDB") {
    oracleViolationCount(df,
      hs(("state", Op.Eq, "state"), ("income", Op.Gt, "income"), ("tax", Op.Leq, "tax")),
      """SELECT count(*) AS viol FROM r t, r s
         WHERE t.rid <> s.rid
           AND t.state = s.state
           AND CAST(t.income AS DOUBLE) > CAST(s.income AS DOUBLE)
           AND CAST(t.tax AS DOUBLE) <= CAST(s.tax AS DOUBLE)""")
  }

  test("oracle: phi2 violation count agrees with DuckDB") {
    oracleViolationCount(df,
      hs(("zip", Op.Eq, "zip"), ("state", Op.Neq, "state")),
      """SELECT count(*) AS viol FROM r t, r s
         WHERE t.rid <> s.rid AND t.zip = s.zip AND t.state <> s.state""")
  }

  test("oracle: single-tuple DC violation count agrees with DuckDB") {
    // not(t.income < t.tax): never violated in the running example; check the
    // inverse not(t.income > t.tax) which every pair violates.
    val hsIdx = Set(pred("income", 0, Op.Leq, "tax", 0))
    import spark.implicits._
    val sparkDf = Seq(ev.violationsOf(hsIdx)).toDF("viol")
    Oracle.assertEquivalent(sparkDf,
      """SELECT count(*) AS viol FROM r t, r s
         WHERE t.rid <> s.rid AND CAST(t.income AS DOUBLE) > CAST(t.tax AS DOUBLE)""",
      "r" -> df.withColumn("rid", monotonically_increasing_id()))
  }

  test("oracle: random DCs on the mixed relation agree with DuckDB") {
    val df2 = Fixtures.smallMixed(spark, n = 30, seed = 5L)
    val space2 = PredicateSpace.build(df2, overlapThreshold = 0.0)
    val rel2 = EncodedRelation.fromDataFrame(df2)
    val ev2 = EvidenceBuilder.build(spark, rel2, space2)
    def idx(ca: String, sa: Int, op: Op, cb: String, sb: Int): Int = {
      val a = space2.colNames.indexOf(ca); val b = space2.colNames.indexOf(cb)
      space2.indexOf(Predicate.normalized(ColRef(sa, a), ColRef(sb, b), op))
    }
    import spark.implicits._
    val cases = Seq(
      (Set(idx("g", 0, Op.Neq, "g", 1)),
        "t.g = s.g"),
      (Set(idx("g", 0, Op.Neq, "g", 1), idx("x", 0, Op.Leq, "x", 1)),
        "t.g = s.g AND CAST(t.x AS DOUBLE) > CAST(s.x AS DOUBLE)"),
      (Set(idx("x", 0, Op.Geq, "y", 1)),
        "CAST(t.x AS DOUBLE) < CAST(s.y AS DOUBLE)"),
      (Set(idx("h", 0, Op.Neq, "h", 1), idx("z", 0, Op.Neq, "z", 1)),
        "t.h = s.h AND CAST(t.z AS DOUBLE) = CAST(s.z AS DOUBLE)"),
    )
    cases.foreach { case (hsIdx, cond) =>
      val sparkDf = Seq(ev2.violationsOf(hsIdx)).toDF("viol")
      Oracle.assertEquivalent(sparkDf,
        s"SELECT count(*) AS viol FROM r t, r s WHERE t.rid <> s.rid AND $cond",
        "r" -> df2.withColumn("rid", monotonically_increasing_id()))
    }
  }
}
