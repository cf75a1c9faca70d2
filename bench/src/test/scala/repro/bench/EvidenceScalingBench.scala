package repro.bench

import repro.SparkSpec
import repro.core.{EncodedRelation, EvidenceBuilder, NaiveEvidenceBuilder, PredicateSpace}
import repro.data.{Datasets, TaxData}
import repro.eval.Tables

/** Companion to Fig. 7: at full bench scale the pair-quadratic evidence
  * construction dominates total time (as in the paper), and the AFASTDC-like
  * per-predicate builder loses to the shared-comparison one by a growing
  * factor. The dataset-size sweep makes the quadratic shape visible.
  */
class EvidenceScalingBench extends SparkSpec {

  test("evidence construction scaling: fast vs naive builder (Tax)") {
    def timed[A](body: => A): (A, Long) = {
      val t0 = System.nanoTime(); val a = body; (a, (System.nanoTime() - t0) / 1000000L)
    }
    val rows = Seq(500, 1000, 2000, 3000).map { n =>
      val df = TaxData.generate(spark, n)
      val space = PredicateSpace.build(df, 0.3)
      val rel = EncodedRelation.fromDataFrame(df)
      val (fastEv, fastMs) = timed(EvidenceBuilder.build(spark, rel, space))
      val (naiveEv, naiveMs) = timed(NaiveEvidenceBuilder.build(spark, rel, space))
      assert(fastEv.checksum == naiveEv.checksum, s"builders disagree at n=$n")
      (n, fastEv.nClasses, fastMs, naiveMs)
    }
    println(Tables.banner("Evidence-set construction scaling (Tax)"))
    println(Tables.fmt(
      Seq("rows", "pairs", "classes", "fastMs", "naiveMs", "naive/fast"),
      rows.map { case (n, cls, f, nv) =>
        Seq(n, n.toLong * (n - 1), cls, f, nv, f"${nv.toDouble / math.max(1, f)}%.2fx")
      }))
    // Shape 1: the naive per-predicate builder is slower at every size that
    // is large enough to measure, and the gap does not shrink with scale.
    val big = rows.filter(_._4 > 300)
    big.foreach { case (n, _, fast, naive) =>
      assert(naive > fast, s"n=$n: naive ($naive ms) not slower than fast ($fast ms)")
    }
    // Shape 2: quadratic growth — 4x the rows costs clearly more than 4x.
    val t500 = rows.head._4.toDouble
    val t2000 = rows(2)._4.toDouble
    assert(t2000 > t500 * 2, s"no quadratic growth visible: $t500 -> $t2000")
  }
}
