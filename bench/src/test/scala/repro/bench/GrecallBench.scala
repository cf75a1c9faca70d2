package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 14 / Sec. 8.4 shape: G-recall (fraction of golden DCs
  * recovered) across thresholds, approximation functions, and the two noise
  * models. Key qualitative claims checked:
  *  - valid DCs (eps = 0) recover (almost) no golden DC on dirty data;
  *  - f1 peaks at small thresholds, f2/f3 at larger ones;
  *  - the skewed (error-concentrated) datasets give higher G-recall for
  *    f2/f3 than the spread ones.
  */
class GrecallBench extends SparkSpec {

  private lazy val rows = Experiments.grecall(spark, Datasets.all)

  test("Fig. 14 — G-recall by threshold, function, noise") {
    println(Tables.banner("Fig. 14 — G-recall (all datasets)"))
    println(Tables.fmt(
      Seq("dataset", "noise", "fn", "eps", "G-recall", "nDCs"),
      rows.map(r => Seq(r.dataset, r.noise, r.fn, r.epsilon, r.grecall, r.nDcs))))

    def avg(sel: Seq[Double]): Double = if (sel.isEmpty) 0.0 else sel.sum / sel.size

    // Valid DCs on dirty data recover almost nothing.
    val atZero = avg(rows.filter(r => r.epsilon == 0.0 && r.fn == "f1").map(_.grecall))
    println(f"\navg G-recall at eps=0 (valid DCs): $atZero%.3f")
    assert(atZero <= 0.35, s"valid-DC G-recall unexpectedly high: $atZero")

    // Approximate thresholds recover much more than valid DCs do.
    val bestPerDataset = rows.filter(_.epsilon > 0).groupBy(r => (r.dataset, r.noise, r.fn))
      .map { case (_, rs) => rs.map(_.grecall).max }
    val bestAvg = avg(bestPerDataset.toSeq)
    println(f"avg best-threshold G-recall: $bestAvg%.3f")
    assert(bestAvg >= 0.5, s"approximate mining failed to recover golden DCs: $bestAvg")
  }

  test("Sec. 8.4 — function-specific threshold behaviour") {
    def avg(sel: Seq[Double]): Double = if (sel.isEmpty) 0.0 else sel.sum / sel.size
    val small = Seq(1e-4, 1e-3)
    val large = Seq(1e-2, 1e-1)
    val f1Small = avg(rows.filter(r => r.fn == "f1" && small.contains(r.epsilon)).map(_.grecall))
    val f1Large = avg(rows.filter(r => r.fn == "f1" && large.contains(r.epsilon)).map(_.grecall))
    val f23Small = avg(rows.filter(r => r.fn != "f1" && small.contains(r.epsilon)).map(_.grecall))
    val f23Large = avg(rows.filter(r => r.fn != "f1" && large.contains(r.epsilon)).map(_.grecall))
    println(f"f1:  avg G-recall small-eps=$f1Small%.3f large-eps=$f1Large%.3f")
    println(f"f2/3: avg G-recall small-eps=$f23Small%.3f large-eps=$f23Large%.3f")
    // Shape: f1 does (relatively) better at small thresholds; f2/f3 gain
    // more than f1 does when moving to large thresholds.
    assert(f1Small >= f1Large - 0.05, "f1 should favour small thresholds")
    assert(f23Large - f23Small >= f1Large - f1Small - 0.05,
      "f2/f3 should gain more at large thresholds than f1")

    // Error-concentrated noise helps f2/f3 (paper's observation).
    val f23Spread = avg(rows.filter(r => r.fn != "f1" && r.noise == "spread" && r.epsilon > 0).map(_.grecall))
    val f23Skewed = avg(rows.filter(r => r.fn != "f1" && r.noise == "skewed" && r.epsilon > 0).map(_.grecall))
    println(f"f2/3: avg G-recall spread=$f23Spread%.3f skewed=$f23Skewed%.3f")
    assert(f23Skewed >= f23Spread - 0.05, "skewed noise should not hurt f2/f3")

    // Sec. 8.4 headline: average G-recall at the per-function best threshold.
    val best = Seq("f1" -> 1e-4, "f2" -> 1e-2, "f3" -> 1e-1)
    println(Tables.banner("Sec. 8.4 — avg G-recall at the paper's best thresholds"))
    println(Tables.fmt(
      Seq("fn", "bestEps", "avg(spread)", "avg(skewed)", "paperAvg"),
      best.zip(Seq(0.71, 0.72, 0.97)).map { case ((fn, eps), paper) =>
        def a(noise: String) =
          avg(rows.filter(r => r.fn == fn && r.epsilon == eps && r.noise == noise).map(_.grecall))
        Seq(fn, eps, a("spread"), a("skewed"), paper)
      }))
  }
}
