package repro.jobs

import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 6 / Fig. 9 / Fig. 10 shapes: ADCEnum vs SearchMC
  * enumeration times on full data and on samples, and the max- vs
  * min-intersection class choice.
  */
object EnumTimesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("enum-times")
    try {
      val rows = Experiments.enumCompare(spark, Datasets.all)
      println(Tables.banner("Fig. 6 — ADCEnum vs SearchMC (f1, eps=0.1)"))
      println(Tables.fmt(
        Seq("dataset", "tuples", "classes", "adcEnumMs", "searchMcMs", "speedup", "nDCs"),
        rows.map(r => Seq(r.dataset, r.nTuples, r.nClasses, r.adcEnumMs, r.searchMcMs,
          f"${r.searchMcMs.toDouble / math.max(1, r.adcEnumMs)}%.2fx", r.nDcs))))

      val sampled = Experiments.enumCompare(spark,
        Seq(Datasets.byName("Tax"), Datasets.byName("Stock"), Datasets.byName("Hospital")),
        sampleFracs = Seq(0.2, 0.4, 0.6, 0.8, 1.0))
      println(Tables.banner("Fig. 9 — enumeration vs sample size"))
      println(Tables.fmt(
        Seq("dataset", "frac", "tuples", "classes", "adcEnumMs", "searchMcMs"),
        sampled.map(r => Seq(r.dataset, r.sampleFrac, r.nTuples, r.nClasses,
          r.adcEnumMs, r.searchMcMs))))

      val choice = Experiments.choiceCompare(spark,
        Seq(Datasets.byName("Tax"), Datasets.byName("Stock"), Datasets.byName("Hospital")))
      println(Tables.banner("Fig. 10 — max vs min intersection choice"))
      println(Tables.fmt(
        Seq("dataset", "fn", "maxChoiceMs", "minChoiceMs", "maxNodes", "minNodes"),
        choice.map(r => Seq(r.dataset, r.fn, r.maxChoiceMs, r.minChoiceMs,
          r.maxNodes, r.minNodes))))
    } finally spark.stop()
  }
}
