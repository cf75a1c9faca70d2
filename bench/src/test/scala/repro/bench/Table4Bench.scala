package repro.bench

import repro.SparkSpec
import repro.eval.{Experiments, Tables}

/** Reproduces Table 4: the dataset census, plus the invariant that every
  * planted golden DC holds exactly on the clean synthetic data.
  */
class Table4Bench extends SparkSpec {

  test("Table 4 — datasets") {
    val rows = Experiments.table4(spark)
    println(Tables.banner("Table 4 — datasets (paper vs synthetic stand-in)"))
    println(Tables.fmt(
      Seq("dataset", "rows", "attrs", "goldenDCs", "paperRows", "paperAttrs",
        "paperGolden", "goldenHoldClean"),
      rows.map(r => Seq(r.dataset, r.rows, r.attrs, r.golden, r.paperRows,
        r.paperAttrs, r.paperGolden, r.goldenHold))))
    assert(rows.size == 8)
    rows.foreach { r =>
      assert(r.attrs == r.paperAttrs, s"${r.dataset}: attribute count")
      assert(r.golden == r.paperGolden, s"${r.dataset}: golden DC count")
      assert(r.goldenHold, s"${r.dataset}: golden DCs must hold on clean data")
    }
  }
}
