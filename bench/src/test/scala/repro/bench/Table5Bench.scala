package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces Table 5: golden rules recovered as short ADCs on dirty data,
  * alongside the longer valid DC (eps = 0) that the same dirty data forces.
  */
class Table5Bench extends SparkSpec {

  test("Table 5 — approximate vs valid DCs") {
    val rows = Experiments.table5(spark,
      Seq("Food", "Airport", "Stock", "Voter").map(Datasets.byName))
    println(Tables.banner("Table 5 — approximate vs valid DCs"))
    rows.foreach { r =>
      println(s"\n[${r.dataset}] golden: ${r.goldenLabel}")
      println(s"  ADC  (eps=${r.adcEpsilon}): ${r.adc}")
      println(s"  valid (eps=0):          ${r.validDc}")
    }
    assert(rows.nonEmpty, "no golden DC was recovered as an ADC")
    // Shape: valid DCs are longer (or absent) — the dirty data forces extra
    // predicates onto at least some of the recovered rules.
    val inflated = rows.count(r => r.validDc.contains(" and ") &&
      r.validDc.split(" and ").length > r.adc.split(" and ").length)
    val missing = rows.count(_.validDc.startsWith("(no valid DC"))
    println(s"\nrecovered=${rows.size} inflatedValid=$inflated noValidExtension=$missing")
    assert(inflated + missing > 0, "expected some valid DCs longer than their ADCs")
  }
}
