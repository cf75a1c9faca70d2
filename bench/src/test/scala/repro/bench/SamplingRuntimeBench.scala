package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 12 shape: total mining time shrinks with the sample
  * size (the evidence construction is pair-quadratic in the sampled rows).
  */
class SamplingRuntimeBench extends SparkSpec {

  test("Fig. 12 — total runtime vs sample size (f1, eps=0.1)") {
    val rows = Experiments.samplingRuntime(spark,
      Seq("Tax", "Stock", "Hospital", "Voter").map(Datasets.byName))
    println(Tables.banner("Fig. 12 — ADCMiner runtime for varying sample sizes"))
    println(Tables.fmt(
      Seq("dataset", "frac", "tuples", "spaceMs", "evidenceMs", "enumMs", "totalMs", "nDCs"),
      rows.map(r => Seq(r.dataset, r.frac, r.nTuples, r.spaceMs, r.evidenceMs,
        r.enumMs, r.totalMs, r.nDcs))))
    // Shape: per dataset, the 20% sample run is cheaper than the full run on
    // the evidence+enum portion (space profiling is sample-independent).
    rows.groupBy(_.dataset).foreach { case (name, rs) =>
      val lo = rs.find(_.frac == 0.2).get
      val hi = rs.find(_.frac == 1.0).get
      assert(lo.evidenceMs + lo.enumMs <= (hi.evidenceMs + hi.enumMs) * 1.1,
        s"$name: sampling did not reduce mining time")
    }
  }
}
