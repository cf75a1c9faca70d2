package repro.jobs

import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 11 / Fig. 12 / Fig. 13 shapes: quality of sample-mined
  * ADCs, runtime reduction from sampling, and the (eps - pHat) ~ 1/sqrt(n)
  * validation of the Sec. 7 analysis.
  */
object SamplingJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("sampling")
    try {
      val quality = Experiments.samplingQuality(spark,
        Seq("Tax", "Stock", "Hospital", "Adult").map(Datasets.byName),
        fns = Seq("f1"), epsilons = Seq(0.01, 0.1),
        fracs = Seq(0.05, 0.1, 0.2, 0.4))
      println(Tables.banner("Fig. 11 — F1 of sample-mined vs full-mined ADCs (f1)"))
      println(Tables.fmt(
        Seq("dataset", "eps", "frac", "precision", "recall", "F1", "nSample", "nFull"),
        quality.map(r => Seq(r.dataset, r.epsilon, r.frac, r.precision, r.recall,
          r.f1, r.nSample, r.nFull))))

      val qualityF23 = Experiments.samplingQuality(spark,
        Seq("Stock", "Adult").map(Datasets.byName),
        fns = Seq("f2", "f3"), epsilons = Seq(0.1), fracs = Seq(0.1, 0.2, 0.4))
      println(Tables.banner("Fig. 11 — F1 under f2/f3"))
      println(Tables.fmt(
        Seq("dataset", "fn", "frac", "precision", "recall", "F1"),
        qualityF23.map(r => Seq(r.dataset, r.fn, r.frac, r.precision, r.recall, r.f1))))

      val runtime = Experiments.samplingRuntime(spark,
        Seq("Tax", "Stock", "Hospital", "Voter").map(Datasets.byName))
      println(Tables.banner("Fig. 12 — total runtime vs sample size"))
      println(Tables.fmt(
        Seq("dataset", "frac", "tuples", "evidenceMs", "enumMs", "totalMs"),
        runtime.map(r => Seq(r.dataset, r.frac, r.nTuples, r.evidenceMs, r.enumMs,
          r.totalMs))))

      val eph = Experiments.epsMinusPhat(spark,
        Seq("Tax", "Stock", "Hospital", "Voter").map(Datasets.byName))
      println(Tables.banner("Fig. 13 — avg(eps - pHat) vs sample size"))
      println(Tables.fmt(
        Seq("dataset", "frac", "pairs", "avgDiff", "avgDiff*sqrt(n)", "nDCs"),
        eph.map(r => Seq(r.dataset, r.frac, r.nPairs, r.avgDiff, r.scaledBySqrtN, r.nDcs))))
    } finally spark.stop()
  }
}
