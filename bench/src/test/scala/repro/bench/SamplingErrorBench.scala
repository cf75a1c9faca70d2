package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 13 shape: the average slack (eps - pHat) over mined
  * ADCs shrinks with the sample size, consistent with the ~1/sqrt(n)
  * behaviour predicted by the Sec. 7 analysis (Inequality 2).
  */
class SamplingErrorBench extends SparkSpec {

  test("Fig. 13 — avg(eps - pHat) vs sample size (f1, eps=0.01)") {
    val rows = Experiments.epsMinusPhat(spark,
      Seq("Tax", "Food", "Airport", "Voter").map(Datasets.byName))
    println(Tables.banner("Fig. 13 — average eps - pHat per sample size"))
    println(Tables.fmt(
      Seq("dataset", "frac", "pairs", "avgDiff", "avgDiff*sqrt(n)", "nDCs"),
      rows.map(r => Seq(r.dataset, r.frac, r.nPairs, r.avgDiff, r.scaledBySqrtN, r.nDcs))))
    rows.foreach(r => assert(r.avgDiff >= 0.0 && r.avgDiff <= 0.01 + 1e-9))
    // Shape: the slack decreases from the smallest to the largest sample.
    rows.groupBy(_.dataset).foreach { case (name, rs) =>
      val sorted = rs.sortBy(_.frac)
      assert(sorted.last.avgDiff <= sorted.head.avgDiff + 1e-3,
        s"$name: eps - pHat did not shrink with the sample")
    }
  }
}
