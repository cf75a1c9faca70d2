package repro.jobs

import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces Table 5: golden DCs recovered as ADCs on dirty data, next to
  * the longer valid DC (epsilon = 0) that covers the same rule.
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table5")
    try {
      val rows = Experiments.table5(spark,
        Seq("Food", "Airport", "Stock", "Voter").map(Datasets.byName))
      println(Tables.banner("Table 5 — approximate vs valid DCs"))
      rows.foreach { r =>
        println(s"\n[${r.dataset} / ${r.noise}] golden: ${r.goldenLabel}")
        println(s"  ADC  (eps=${r.adcEpsilon}): ${r.adc}")
        println(s"  valid(eps=0):           ${r.validDc}")
      }
    } finally spark.stop()
  }
}
