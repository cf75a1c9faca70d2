package repro.data

import repro.SparkSpec
import repro.core._

/** Table 4 invariants for every synthetic dataset: schema arity, golden DC
  * count, golden DCs hold exactly on clean data, and every golden predicate
  * survives the 30%-common-values pruning (else it could never be mined).
  */
class DatasetsSpec extends SparkSpec {

  private val testRows = Map(
    "Tax" -> 400, "Stock" -> 360, "Hospital" -> 360, "Food" -> 400,
    "Airport" -> 300, "Adult" -> 300, "Flight" -> 400, "Voter" -> 400)

  private lazy val built: Map[String, (PredicateSpace, Evidence)] =
    Datasets.all.map { d =>
      val df = d.generate(spark, testRows(d.name))
      val space = PredicateSpace.build(df, overlapThreshold = 0.3)
      val rel = EncodedRelation.fromDataFrame(df)
      d.name -> (space, EvidenceBuilder.build(spark, rel, space))
    }.toMap

  Datasets.all.foreach { d =>
    test(s"${d.name}: attribute count matches Table 4") {
      assert(d.schema.size == d.paperAttrs)
    }

    test(s"${d.name}: golden DC count matches Table 4") {
      assert(d.golden.size == d.goldenDcs.size)
      val expected = Map("Tax" -> 9, "Stock" -> 6, "Hospital" -> 7, "Food" -> 10,
        "Airport" -> 9, "Adult" -> 3, "Flight" -> 13, "Voter" -> 12)
      assert(d.golden.size == expected(d.name))
    }

    test(s"${d.name}: generation is deterministic in (rows, seed)") {
      val a = d.rows(50, 7L)
      val b = d.rows(50, 7L)
      assert(a == b)
      assert(d.rows(50, 8L) != a)
    }

    test(s"${d.name}: default row count is positive and scaled down") {
      assert(d.defaultRows > 0 && d.defaultRows <= 5000)
    }

    test(s"${d.name}: every golden predicate survives the 30% pruning") {
      val (space, _) = built(d.name)
      d.goldenDcs.foreach { dc =>
        dc.preds.foreach { p =>
          assert(space.indexOf.contains(p), s"${d.name}: missing $p of ${dc.pretty(space.colNames)}")
        }
      }
    }

    test(s"${d.name}: clean data satisfies every golden DC exactly") {
      val (space, ev) = built(d.name)
      d.goldenDcs.foreach { dc =>
        val hs = dc.preds.map(p => space.indexOf(p.complement))
        assert(ev.violationsOf(hs) == 0L, s"${d.name}: violated ${dc.pretty(space.colNames)}")
      }
    }

    test(s"${d.name}: golden DCs are not vacuous (proper sub-DCs are violated)") {
      val (space, ev) = built(d.name)
      d.goldenDcs.foreach { dc =>
        if (dc.preds.size > 1) {
          // at least one single-predicate-removal weakening must be violated,
          // otherwise the golden DC could never be a *minimal* ADC.
          val someSubViolated = dc.preds.exists { p =>
            val hs = (dc.preds - p).map(q => space.indexOf(q.complement))
            ev.violationsOf(hs) > 0L
          }
          assert(someSubViolated, s"${d.name}: vacuous ${dc.pretty(space.colNames)}")
        }
      }
    }
  }

  test("registry exposes all eight datasets in Table 4 order") {
    assert(Datasets.all.map(_.name) ==
      Seq("Tax", "Stock", "Hospital", "Food", "Airport", "Adult", "Flight", "Voter"))
    assert(Datasets.byName("tax") == TaxData)
    intercept[IllegalArgumentException](Datasets.byName("nope"))
  }

  test("paper tuple counts are recorded for Table 4") {
    assert(Datasets.all.map(_.paperTuples) ==
      Seq("1M", "123K", "115K", "200K", "55K", "32K", "582K", "950K"))
  }

  test("golden DCs on clean Adult are minimal ADCs and mined end to end") {
    val df = AdultData.generate(spark, 300)
    val res = AdcMiner.mine(spark, df,
      MinerConfig(fName = "f1", epsilon = 1e-4, maxDcSize = 3))
    val mined = res.dcs.map(_.canonical).toSet
    AdultData.goldenDcs.foreach { dc =>
      val hs = dc.preds.map(p => res.space.indexOf(p.complement))
      val g = new F1(res.evidence).g(res.evidence.violatingClasses(hs).iterator)
      assert(g == 0.0, s"golden violated: $dc")
      val minimal = dc.preds.forall { p =>
        val sub = (dc.preds - p).map(q => res.space.indexOf(q.complement))
        new F1(res.evidence).g(res.evidence.violatingClasses(sub).iterator) > 1e-4
      }
      assert(minimal, s"golden not minimal at eps=1e-4: $dc")
      assert(mined.contains(dc.canonical), s"golden not mined: $dc")
    }
  }
}
