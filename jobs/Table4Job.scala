package repro.jobs

import repro.eval.{Experiments, Tables}

/** Reproduces Table 4: dataset census (tuples, attributes, golden DCs) plus
  * a check that the planted golden DCs hold exactly on the clean data.
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table4")
    try {
      val rows = Experiments.table4(spark)
      println(Tables.banner("Table 4 — datasets"))
      println(Tables.fmt(
        Seq("dataset", "rows", "attrs", "goldenDCs", "paperRows", "paperAttrs",
          "paperGolden", "goldenHoldClean"),
        rows.map(r => Seq(r.dataset, r.rows, r.attrs, r.golden, r.paperRows,
          r.paperAttrs, r.paperGolden, r.goldenHold))))
    } finally spark.stop()
  }
}
