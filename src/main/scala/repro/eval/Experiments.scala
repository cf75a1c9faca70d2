package repro.eval

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.data._

/** Harness for the reproduced evaluation exhibits (Sec. 8). Every public
  * method corresponds to one table/figure of the paper and returns typed
  * rows; `Tables.fmt` renders them. Bench suites and spark-submit jobs both
  * call these, so measured numbers in EXPERIMENTS.md come from one code path.
  */
object Experiments {

  /** Rows per dataset used by the benches; override with BENCH_SCALE (a
    * multiplier, e.g. 0.5 halves every dataset).
    */
  def benchRows(d: BenchDataset, rowsOverride: Map[String, Int] = Map.empty): Int = {
    val scale = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(1.0)
    val base = rowsOverride.getOrElse(d.name, d.defaultRows)
    math.max(60, (base * scale).toInt)
  }

  /** Per-dataset rows for the *timing* benches: sized so the evidence sets
    * stay in the regime where the single-threaded FASTDC-style baseline
    * finishes in tens of seconds (calibrated; see EXPERIMENTS.md). The
    * enumeration problem (predicate space, class structure) is unchanged —
    * only the pair bag shrinks.
    */
  val timingRows: Map[String, Int] = Map(
    "Tax" -> 750, "Stock" -> 310, "Hospital" -> 150, "Food" -> 750,
    "Airport" -> 550, "Adult" -> 120, "Flight" -> 120, "Voter" -> 1000)

  /** Rows for the function-split and G-recall benches (f2/f3 enumeration at
    * large epsilon is the costly path).
    */
  val qualityRows: Map[String, Int] = Map(
    "Tax" -> 400, "Stock" -> 250, "Hospital" -> 150, "Food" -> 400,
    "Airport" -> 300, "Adult" -> 120, "Flight" -> 120, "Voter" -> 400)

  private def timed[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1000000L)
  }

  private def medianMs(repeats: Int)(body: => Unit): Long = {
    val ts = (0 until math.max(1, repeats)).map(_ => timed(body)._2).sorted
    ts(ts.length / 2)
  }

  /** Build (space, evidence) for a dataset at bench scale. */
  def prepare(spark: SparkSession, df: DataFrame, needVios: Boolean): (PredicateSpace, Evidence, Long, Long) = {
    val (space, spaceMs) = timed(PredicateSpace.build(df, 0.3))
    val rel = EncodedRelation.fromDataFrame(df)
    val (ev, evMs) = timed(EvidenceBuilder.build(spark, rel, space, needVios))
    (space, ev, spaceMs, evMs)
  }

  // ------------------------------------------------------------------
  // Table 4
  // ------------------------------------------------------------------
  final case class Table4Row(dataset: String, rows: Long, attrs: Int, golden: Int,
      paperRows: String, paperAttrs: Int, paperGolden: Int, goldenHold: Boolean)

  def table4(spark: SparkSession, rows: Map[String, Int] = Map.empty): Seq[Table4Row] =
    Datasets.all.map { d =>
      val df = d.generate(spark, benchRows(d, rows))
      val (space, ev, _, _) = prepare(spark, df, needVios = false)
      val hold = d.goldenDcs.forall { dc =>
        ev.violationsOf(dc.preds.map(p => space.indexOf(p.complement))) == 0L
      }
      Table4Row(d.name, df.count(), d.schema.size, d.golden.size,
        d.paperTuples, d.paperAttrs, d.golden.size, hold)
    }

  // ------------------------------------------------------------------
  // Fig. 6 / Fig. 9: ADCEnum vs SearchMC enumeration time
  // ------------------------------------------------------------------
  final case class EnumRow(dataset: String, fn: String, sampleFrac: Double,
      nTuples: Int, nPreds: Int, nClasses: Int,
      adcEnumMs: Long, searchMcMs: Long, adcNodes: Long, mcNodes: Long, nDcs: Int)

  def enumCompare(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fn: String = "f1",
      epsilon: Double = 0.1,
      maxDcSize: Int = 3,
      sampleFracs: Seq[Double] = Seq(1.0),
      repeats: Int = 1,
      seed: Long = 42L,
      rows: Map[String, Int] = timingRows): Seq[EnumRow] =
    for (d <- datasets; frac <- sampleFracs) yield {
      val df = d.generate(spark, benchRows(d, rows))
      val sampled = Sampler.sample(df, frac, seed)
      val (space, ev, _, _) = prepare(spark, sampled, ApproxFunction.needsVios(fn))
      var nDcs = 0; var adcNodes = 0L; var mcNodes = 0L
      val adcMs = medianMs(repeats) {
        val f = ApproxFunction(fn, ev, epsilon)
        val e = new AdcEnum(ev.masks, ev.counts, ev.nPreds, space.groupOf, f, epsilon,
          true, maxDcSize)
        nDcs = e.enumerate().size
        adcNodes = e.nodes
      }
      val mcMs = medianMs(repeats) {
        val f = ApproxFunction(fn, ev, epsilon)
        val e = new SearchMC(ev.masks, ev.counts, ev.nPreds, space.groupOf, f, epsilon, maxDcSize)
        e.enumerate()
        mcNodes = e.nodes
      }
      EnumRow(d.name, fn, frac, ev.nTuples, space.size, ev.nClasses,
        adcMs, mcMs, adcNodes, mcNodes, nDcs)
    }

  // ------------------------------------------------------------------
  // Fig. 10: max- vs min-intersection choice in ADCEnum
  // ------------------------------------------------------------------
  final case class ChoiceRow(dataset: String, fn: String,
      maxChoiceMs: Long, minChoiceMs: Long, maxNodes: Long, minNodes: Long)

  def choiceCompare(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fns: Seq[String] = Seq("f1", "f2", "f3"),
      epsilon: Double = 0.1,
      maxDcSize: Int = 3,
      repeats: Int = 1,
      rows: Map[String, Int] = qualityRows): Seq[ChoiceRow] =
    for (d <- datasets; fn <- fns) yield {
      val df = d.generate(spark, benchRows(d, rows))
      val (space, ev, _, _) = prepare(spark, df, ApproxFunction.needsVios(fn))
      var maxNodes = 0L; var minNodes = 0L
      val maxMs = medianMs(repeats) {
        val e = new AdcEnum(ev.masks, ev.counts, ev.nPreds, space.groupOf,
          ApproxFunction(fn, ev, epsilon), epsilon, true, maxDcSize)
        e.enumerate(); maxNodes = e.nodes
      }
      val minMs = medianMs(repeats) {
        val e = new AdcEnum(ev.masks, ev.counts, ev.nPreds, space.groupOf,
          ApproxFunction(fn, ev, epsilon), epsilon, false, maxDcSize)
        e.enumerate(); minNodes = e.nodes
      }
      ChoiceRow(d.name, fn, maxMs, minMs, maxNodes, minNodes)
    }

  // ------------------------------------------------------------------
  // Fig. 7: total time ADCMiner vs DCFinder-like vs AFASTDC-like
  // Fig. 8: ADCMiner per approximation function, evidence vs enum split
  // ------------------------------------------------------------------
  final case class TotalRow(dataset: String, system: String, fn: String,
      spaceMs: Long, evidenceMs: Long, enumMs: Long, nDcs: Int) {
    def totalMs: Long = spaceMs + evidenceMs + enumMs
  }

  def totalCompare(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      epsilon: Double = 0.1,
      maxDcSize: Int = 3,
      rows: Map[String, Int] = timingRows): Seq[TotalRow] =
    datasets.flatMap { d =>
      val df = d.generate(spark, benchRows(d, rows))
      val (space, spaceMs) = timed(PredicateSpace.build(df, 0.3))
      val rel = EncodedRelation.fromDataFrame(df)
      val (fastEv, fastMs) = timed(EvidenceBuilder.build(spark, rel, space))
      val (naiveEv, naiveMs) = timed(NaiveEvidenceBuilder.build(spark, rel, space))
      def enumerate(searchMc: Boolean, ev: Evidence): (Int, Long) = {
        val cfg = MinerConfig(fName = "f1", epsilon = epsilon, maxDcSize = maxDcSize,
          searchMc = searchMc)
        val r = AdcMiner.mineFromEvidence(ev, space, cfg)
        (r.dcs.size, r.enumMs)
      }
      val (nAdc, adcEnumMs) = enumerate(searchMc = false, fastEv)
      val (_, mcEnumMs) = enumerate(searchMc = true, fastEv)
      // naiveEv equals fastEv (differential-tested), so SearchMC over it is
      // the same computation; reuse the measured enumeration time.
      require(naiveEv.counts.sum == fastEv.counts.sum, "evidence builders disagree")
      Seq(
        TotalRow(d.name, "ADCMiner", "f1", spaceMs, fastMs, adcEnumMs, nAdc),
        TotalRow(d.name, "DCFinder-like", "f1", spaceMs, fastMs, mcEnumMs, nAdc),
        TotalRow(d.name, "AFASTDC-like", "f1", spaceMs, naiveMs, mcEnumMs, nAdc))
    }

  def totalByFunction(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      epsilon: Double = 0.1,
      maxDcSize: Int = 3,
      rows: Map[String, Int] = qualityRows): Seq[TotalRow] =
    datasets.flatMap { d =>
      val df = d.generate(spark, benchRows(d, rows))
      val (space, ev, spaceMs, evMs) = prepare(spark, df, needVios = true)
      Seq("f1", "f2", "f3").map { fn =>
        val r = AdcMiner.mineFromEvidence(ev, space,
          MinerConfig(fName = fn, epsilon = epsilon, maxDcSize = maxDcSize))
        TotalRow(d.name, "ADCMiner", fn, spaceMs, evMs, r.enumMs, r.dcs.size)
      }
    }

  // ------------------------------------------------------------------
  // Fig. 11: F1 score of sample-mined vs full-mined ADCs
  // Fig. 12: total runtime for varying sample sizes
  // Fig. 13: average (epsilon - pHat) over mined ADCs per sample size
  // ------------------------------------------------------------------
  final case class SampleQualityRow(dataset: String, fn: String, epsilon: Double,
      frac: Double, precision: Double, recall: Double, f1: Double,
      nSample: Int, nFull: Int)

  def samplingQuality(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fns: Seq[String],
      epsilons: Seq[Double],
      fracs: Seq[Double],
      maxDcSize: Int = 3,
      seed: Long = 7L,
      rows: Map[String, Int] = qualityRows): Seq[SampleQualityRow] =
    datasets.flatMap { d =>
      val df = d.generate(spark, benchRows(d, rows))
      val needVios = fns.exists(ApproxFunction.needsVios)
      val (space, fullEv, _, _) = prepare(spark, df, needVios)
      val sampleEvs = fracs.map { frac =>
        val sampled = Sampler.sample(df, frac, seed)
        val rel = EncodedRelation.fromDataFrame(sampled)
        frac -> EvidenceBuilder.build(spark, rel, space, needVios)
      }
      for (fn <- fns; eps <- epsilons) yield {
        val cfg = MinerConfig(fName = fn, epsilon = eps, maxDcSize = maxDcSize)
        val full = AdcMiner.mineFromEvidence(fullEv, space, cfg).dcs
        sampleEvs.map { case (frac, sev) =>
          val sample = AdcMiner.mineFromEvidence(sev, space, cfg).dcs
          val m = Metrics.prf(sample, full)
          SampleQualityRow(d.name, fn, eps, frac, m.precision, m.recall, m.f1,
            sample.size, full.size)
        }
      }
    }.flatten

  final case class SampleRuntimeRow(dataset: String, frac: Double,
      nTuples: Int, spaceMs: Long, evidenceMs: Long, enumMs: Long, nDcs: Int) {
    def totalMs: Long = spaceMs + evidenceMs + enumMs
  }

  def samplingRuntime(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fracs: Seq[Double] = Seq(0.2, 0.4, 0.6, 0.8, 1.0),
      epsilon: Double = 0.1,
      maxDcSize: Int = 3,
      seed: Long = 11L,
      rows: Map[String, Int] = timingRows): Seq[SampleRuntimeRow] =
    for (d <- datasets; frac <- fracs) yield {
      val df = d.generate(spark, benchRows(d, rows))
      val cfg = MinerConfig(fName = "f1", epsilon = epsilon, sampleFraction = frac,
        maxDcSize = maxDcSize, seed = seed)
      val r = AdcMiner.mine(spark, df, cfg)
      SampleRuntimeRow(d.name, frac, r.sampleRows, r.spaceMs, r.evidenceMs, r.enumMs,
        r.dcs.size)
    }

  final case class EpsHatRow(dataset: String, frac: Double, nPairs: Long,
      avgDiff: Double, scaledBySqrtN: Double, nDcs: Int)

  def epsMinusPhat(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fracs: Seq[Double] = Seq(0.05, 0.1, 0.2, 0.4, 0.6, 0.8),
      epsilon: Double = 0.01,
      maxDcSize: Int = 3,
      seed: Long = 13L,
      rows: Map[String, Int] = qualityRows): Seq[EpsHatRow] =
    for (d <- datasets; frac <- fracs) yield {
      val df = d.generate(spark, benchRows(d, rows))
      val space = PredicateSpace.build(df, 0.3)
      val sampled = Sampler.sample(df, frac, seed)
      val rel = EncodedRelation.fromDataFrame(sampled)
      val ev = EvidenceBuilder.build(spark, rel, space)
      val r = AdcMiner.mineFromEvidence(ev, space,
        MinerConfig(fName = "f1", epsilon = epsilon, maxDcSize = maxDcSize))
      val diffs = r.hittingSets.map { hs =>
        epsilon - ev.violationsOf(hs).toDouble / math.max(1L, ev.totalPairs)
      }
      val avg = if (diffs.isEmpty) 0.0 else diffs.sum / diffs.size
      EpsHatRow(d.name, frac, ev.totalPairs, avg,
        avg * math.sqrt(ev.totalPairs.toDouble), r.dcs.size)
    }

  // ------------------------------------------------------------------
  // Fig. 14 + Sec. 8.4: G-recall under spread/skewed noise
  // ------------------------------------------------------------------
  final case class GrecallRow(dataset: String, noise: String, fn: String,
      epsilon: Double, grecall: Double, nDcs: Int)

  def grecall(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fns: Seq[String] = Seq("f1", "f2", "f3"),
      epsilons: Seq[Double] = Seq(0.0, 1e-4, 1e-3, 1e-2, 1e-1),
      maxDcSize: Int = 3,
      spreadCellProb: Double = 0.004,
      skewedTupleProb: Double = 0.008,
      seed: Long = 17L,
      rows: Map[String, Int] = qualityRows): Seq[GrecallRow] =
    datasets.flatMap { d =>
      val clean = d.generate(spark, benchRows(d, rows))
      val golden = d.goldenDcs
      val dirty = Seq(
        "spread" -> Noise.spread(clean, spreadCellProb, seed),
        "skewed" -> Noise.skewed(clean, skewedTupleProb, 0.5, seed + 1))
      // The predicate space is profiled on the clean relation so golden
      // predicates stay in-space (typos barely move the overlap ratios).
      val space = PredicateSpace.build(clean, 0.3)
      dirty.flatMap { case (noiseName, df) =>
        val rel = EncodedRelation.fromDataFrame(df)
        val ev = EvidenceBuilder.build(spark, rel, space, needVios = true)
        for (fn <- fns; eps <- epsilons) yield {
          val r = AdcMiner.mineFromEvidence(ev, space,
            MinerConfig(fName = fn, epsilon = eps, maxDcSize = maxDcSize))
          GrecallRow(d.name, noiseName, fn, eps,
            Metrics.gRecall(r.dcs, golden), r.dcs.size)
        }
      }
    }

  // ------------------------------------------------------------------
  // Table 5: approximate vs valid DCs
  // ------------------------------------------------------------------
  final case class Table5Row(dataset: String, noise: String, goldenLabel: String,
      adc: String, adcEpsilon: Double, validDc: String)

  /** For each golden DC recovered as an ADC on the dirty data, report it next
    * to a minimal *valid* DC (epsilon = 0) extending it — the paper's
    * "longer, less general" counterpart (Table 5).
    */
  def table5(
      spark: SparkSession,
      datasets: Seq[BenchDataset],
      fnEps: (String, Double) = ("f1", 1e-3),
      maxDcSize: Int = 5,
      seed: Long = 19L,
      rows: Map[String, Int] = qualityRows): Seq[Table5Row] =
    datasets.flatMap { d =>
      val clean = d.generate(spark, benchRows(d, rows))
      val dirty = Noise.spread(clean, 0.004, seed)
      val space = PredicateSpace.build(clean, 0.3)
      val rel = EncodedRelation.fromDataFrame(dirty)
      val ev = EvidenceBuilder.build(spark, rel, space)
      val (fn, eps) = fnEps
      val adcs = AdcMiner.mineFromEvidence(ev, space,
        MinerConfig(fName = fn, epsilon = eps, maxDcSize = maxDcSize)).dcs
      val valid = AdcMiner.mineFromEvidence(ev, space,
        MinerConfig(fName = fn, epsilon = 0.0, maxDcSize = maxDcSize)).dcs
      val adcSet = adcs.map(_.canonical).toSet
      d.goldenDcs.zip(d.golden).collect {
        case (g, meta) if adcSet.contains(g.canonical) =>
          val extended = valid
            .find(v => g.canonical.preds.subsetOf(v.canonical.preds) &&
              v.preds.size > g.preds.size)
            .orElse(valid.find(v => v.canonical == g.canonical))
          Table5Row(d.name, "spread", meta.label,
            g.pretty(space.colNames), eps,
            extended.map(_.pretty(space.colNames)).getOrElse("(no valid DC extends it)"))
      }
    }
}
