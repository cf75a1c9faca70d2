package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 11 shape: precision/recall/F1 of ADCs mined from a
  * uniform tuple sample against ADCs mined from the full dataset, for
  * varying sample sizes and thresholds under all three functions.
  */
class SamplingQualityBench extends SparkSpec {

  test("Fig. 11 — F1 vs sample size under f1 (eps in {0.01, 0.1})") {
    val rows = Experiments.samplingQuality(spark,
      Seq("Tax", "Stock", "Hospital", "Adult").map(Datasets.byName),
      fns = Seq("f1"), epsilons = Seq(0.01, 0.1),
      fracs = Seq(0.05, 0.1, 0.2, 0.4))
    println(Tables.banner("Fig. 11 — sample-mined vs full-mined ADCs (f1)"))
    println(Tables.fmt(
      Seq("dataset", "eps", "frac", "precision", "recall", "F1", "nSample", "nFull"),
      rows.map(r => Seq(r.dataset, r.epsilon, r.frac, r.precision, r.recall, r.f1,
        r.nSample, r.nFull))))
    rows.foreach(r => assert(r.f1 >= 0.0 && r.f1 <= 1.0))
    // Shape: larger samples give more accurate results (averaged, endpoints).
    for (eps <- Seq(0.01, 0.1)) {
      val sel = rows.filter(_.epsilon == eps)
      val lo = sel.filter(_.frac == 0.05).map(_.f1)
      val hi = sel.filter(_.frac == 0.4).map(_.f1)
      assert(hi.sum / hi.size >= lo.sum / lo.size - 0.02,
        s"eps=$eps: F1 not improving with sample size")
    }
  }

  test("Fig. 11 — F1 vs sample size under f2/f3 (eps=0.01)") {
    val rows = Experiments.samplingQuality(spark,
      Seq("Food", "Airport", "Voter").map(Datasets.byName),
      fns = Seq("f2", "f3"), epsilons = Seq(0.01),
      fracs = Seq(0.1, 0.2, 0.4))
    println(Tables.banner("Fig. 11 — sample-mined vs full-mined ADCs (f2/f3)"))
    println(Tables.fmt(
      Seq("dataset", "fn", "frac", "precision", "recall", "F1", "nSample", "nFull"),
      rows.map(r => Seq(r.dataset, r.fn, r.frac, r.precision, r.recall, r.f1,
        r.nSample, r.nFull))))
    rows.foreach(r => assert(r.f1 >= 0.0 && r.f1 <= 1.0))
    val lo = rows.filter(_.frac == 0.1).map(_.f1)
    val hi = rows.filter(_.frac == 0.4).map(_.f1)
    assert(hi.sum / hi.size >= lo.sum / lo.size - 0.02, "F1 not improving with sample size")
  }
}
