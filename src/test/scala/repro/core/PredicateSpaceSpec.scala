package repro.core

import repro.{Fixtures, SparkSpec}

class PredicateSpaceSpec extends SparkSpec {

  private lazy val df = Fixtures.runningExample(spark)

  test("same-column cross-tuple predicates always generated") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.3)
    // name/state/zip: 2 predicates each; income/tax: 6 each.
    for (c <- Seq("name", "state", "zip")) {
      val i = space.colNames.indexOf(c)
      val preds = space.predicates.filter(p => p.a == ColRef(0, i) && p.b == ColRef(1, i))
      assert(preds.map(_.op).toSet == Set(Op.Eq, Op.Neq), c)
    }
    for (c <- Seq("income", "tax")) {
      val i = space.colNames.indexOf(c)
      val preds = space.predicates.filter(p => p.a == ColRef(0, i) && p.b == ColRef(1, i))
      assert(preds.map(_.op).toSet == Op.all.toSet, c)
    }
  }

  test("income/tax share no values: cross predicates pruned at 30%") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.3)
    val inc = space.colNames.indexOf("income")
    val tax = space.colNames.indexOf("tax")
    assert(!space.predicates.exists(p =>
      Set(p.a.col, p.b.col) == Set(inc, tax)))
  }

  test("threshold 0 generates the Table 3 cross predicates") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.0)
    val inc = space.colNames.indexOf("income")
    val tax = space.colNames.indexOf("tax")
    // t.Income > t'.Tax from Table 3 of the paper.
    val p = Predicate.normalized(ColRef(0, inc), ColRef(1, tax), Op.Gt)
    assert(space.indexOf.contains(p))
    // Same-tuple variant t.Income > t.Tax as well.
    assert(space.indexOf.contains(Predicate.normalized(ColRef(0, inc), ColRef(0, tax), Op.Gt)))
  }

  test("numeric and string columns never compared") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.0)
    space.predicates.foreach { p =>
      assert(space.colIsNumeric(p.a.col) == space.colIsNumeric(p.b.col), p)
    }
  }

  test("string pairs use only equality operators") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.0)
    space.predicates.foreach { p =>
      if (!space.colIsNumeric(p.a.col)) assert(!p.op.isOrder, p)
    }
  }

  test("complement of every predicate is in the space, groups are op-families") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.0)
    space.predicates.indices.foreach { i =>
      val ci = space.complementOf(i)
      assert(space.predicates(ci) == space.predicates(i).complement)
      assert(space.complementOf(ci) == i)
      assert(space.groupOf(ci) == space.groupOf(i)) // complements share the group
    }
    space.groupMembers.foreach { members =>
      val keys = members.map(space.predicates(_).groupKey).distinct
      assert(keys.size == 1)
    }
  }

  test("predicates are unique and normalized") {
    val space = PredicateSpace.build(df, overlapThreshold = 0.0)
    assert(space.predicates.distinct.size == space.size)
    space.predicates.foreach { p =>
      assert(ColRef.ordering.lt(p.a, p.b), s"not normalized: $p")
    }
  }

  test("overlap profiling agrees with the DuckDB oracle") {
    import org.apache.spark.sql.functions._
    // Spark side: distinct-common-value count between zip (string col) pairs
    // computed exactly like PredicateSpace.overlappingPairs does.
    val vals = df.select(col("zip").cast("string").as("v")).distinct()
      .withColumn("side", lit("zip"))
    val other = df.select(col("state").cast("string").as("v")).distinct()
      .withColumn("side", lit("state"))
    val sparkDf = vals.select("v").intersect(other.select("v"))
      .agg(count(lit(1)).cast("long").as("common"))
    repro.Oracle.assertEquivalent(
      sparkDf,
      """SELECT count(*) AS common FROM
         (SELECT DISTINCT zip AS v FROM r) x
         JOIN (SELECT DISTINCT state AS v FROM r) y USING (v)""",
      "r" -> df)
  }

  test("overlappingPairs matches a hand computation on a crafted frame") {
    import org.apache.spark.sql.types._
    import org.apache.spark.sql.Row
    import scala.jdk.CollectionConverters._
    val schema = StructType(Seq(
      StructField("a", DoubleType), StructField("b", DoubleType),
      StructField("c", DoubleType)))
    // a: {1,2,3,4,5}; b: {1,2,3,10,11}; c: {100..104} -> overlap(a,b)=3/5,
    // overlap(a,c)=0, overlap(b,c)=0.
    val rows = (0 until 5).map(i =>
      Row((i + 1).toDouble, Seq(1.0, 2.0, 3.0, 10.0, 11.0)(i), (100 + i).toDouble))
    val df2 = spark.createDataFrame(rows.asJava, schema)
    val pairs = PredicateSpace.overlappingPairs(df2, IndexedSeq(true, true, true), 0.3)
    assert(pairs == Set((0, 1)))
    val pairsAll = PredicateSpace.overlappingPairs(df2, IndexedSeq(true, true, true), 0.6)
    assert(pairsAll == Set((0, 1))) // 3/5 = 0.6 boundary inclusive
    val none = PredicateSpace.overlappingPairs(df2, IndexedSeq(true, true, true), 0.61)
    assert(none == Set.empty)
  }
}
