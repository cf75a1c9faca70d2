package repro.data

import repro.SparkSpec

class NoiseSpec extends SparkSpec {

  private def diffCells(a: Seq[org.apache.spark.sql.Row], b: Seq[org.apache.spark.sql.Row]): Seq[(Int, Int)] =
    for {
      i <- a.indices
      c <- 0 until a(i).size
      if a(i).get(c) != b(i).get(c)
    } yield (i, c)

  private lazy val clean = AdultData.generate(spark, 400)
  private lazy val cleanRows = clean.collect().toSeq

  test("spread noise modifies roughly cellProb of the cells") {
    val dirty = Noise.spread(clean, cellProb = 0.01, seed = 3L)
    val diffs = diffCells(cleanRows, dirty.collect().toSeq)
    val expected = 400 * 15 * 0.01
    assert(diffs.size > expected * 0.4 && diffs.size < expected * 2.5,
      s"got ${diffs.size}, expected ~$expected")
  }

  test("spread noise scatters errors across many tuples") {
    val dirty = Noise.spread(clean, cellProb = 0.01, seed = 3L)
    val diffs = diffCells(cleanRows, dirty.collect().toSeq)
    val tuples = diffs.map(_._1).distinct.size
    // with p=0.01 per cell, two hits in one tuple are rare
    assert(tuples >= diffs.size * 0.7)
  }

  test("skewed noise concentrates errors in few tuples") {
    val dirty = Noise.skewed(clean, tupleProb = 0.01, cellProb = 0.5, seed = 5L)
    val diffs = diffCells(cleanRows, dirty.collect().toSeq)
    val tuples = diffs.map(_._1).distinct.size
    assert(tuples <= 12, s"too many dirty tuples: $tuples")
    if (tuples > 0) {
      // several cells per dirty tuple on average
      assert(diffs.size.toDouble / tuples >= 2.0)
    }
  }

  test("noise preserves schema and row count") {
    val dirty = Noise.spread(clean, cellProb = 0.01, seed = 7L)
    assert(dirty.schema == clean.schema)
    assert(dirty.count() == clean.count())
  }

  test("noise is deterministic in the seed") {
    val a = Noise.spread(clean, cellProb = 0.01, seed = 9L).collect().toSeq
    val b = Noise.spread(clean, cellProb = 0.01, seed = 9L).collect().toSeq
    assert(a == b)
  }

  test("corrupted values keep their column type class") {
    val dirty = Noise.spread(clean, cellProb = 0.02, seed = 11L)
    val rows = dirty.collect().toSeq
    diffCells(cleanRows, rows).foreach { case (i, c) =>
      val orig = cleanRows(i).get(c)
      val now = rows(i).get(c)
      assert(orig.getClass == now.getClass, s"type drift at ($i,$c): $orig -> $now")
    }
  }

  test("zero probability noise is the identity") {
    val dirty = Noise.spread(clean, cellProb = 0.0, seed = 13L)
    assert(dirty.collect().toSeq == cleanRows)
  }

  test("noise breaks golden FDs (errors become DC violations)") {
    import repro.core._
    val df = FoodData.generate(spark, 300)
    val dirty = Noise.spread(df, cellProb = 0.02, seed = 17L)
    val space = PredicateSpace.build(df, overlapThreshold = 0.3)
    val rel = EncodedRelation.fromDataFrame(dirty)
    val ev = EvidenceBuilder.build(spark, rel, space)
    val violatedGolden = FoodData.goldenDcs.count { dc =>
      ev.violationsOf(dc.preds.map(p => space.indexOf(p.complement))) > 0
    }
    assert(violatedGolden >= FoodData.golden.size / 2,
      s"only $violatedGolden golden DCs violated after noise")
  }
}
