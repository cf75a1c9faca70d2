package repro.jobs

import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 7 / Fig. 8 shapes: total mining time of ADCMiner vs
  * the DCFinder-like and AFASTDC-like baselines, and ADCMiner's per-function
  * time split (evidence construction vs enumeration).
  */
object TotalTimesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("total-times")
    try {
      val rows = Experiments.totalCompare(spark, Datasets.all)
      println(Tables.banner("Fig. 7 — total runtime by system (f1, eps=0.1)"))
      println(Tables.fmt(
        Seq("dataset", "system", "spaceMs", "evidenceMs", "enumMs", "totalMs", "nDCs"),
        rows.map(r => Seq(r.dataset, r.system, r.spaceMs, r.evidenceMs, r.enumMs,
          r.totalMs, r.nDcs))))

      val byFn = Experiments.totalByFunction(spark, Datasets.all)
      println(Tables.banner("Fig. 8 — ADCMiner per approximation function"))
      println(Tables.fmt(
        Seq("dataset", "fn", "spaceMs", "evidenceMs", "enumMs", "totalMs", "nDCs"),
        byFn.map(r => Seq(r.dataset, r.fn, r.spaceMs, r.evidenceMs, r.enumMs,
          r.totalMs, r.nDcs))))
    } finally spark.stop()
  }
}
