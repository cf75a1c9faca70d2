package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Configuration of one ADCMiner run (Fig. 1).
  *
  * @param fName              approximation function: f1 | f2 | f3 | f1adj
  * @param epsilon            approximation threshold ε ≥ 0
  * @param sampleFraction     uniform tuple-sample fraction (1.0 = whole D)
  * @param alpha              error bound for the f1adj acceptance (Sec. 7.2)
  * @param overlapThreshold   common-values ratio for comparable columns
  * @param maxDcSize          FASTDC-style cap on predicates per DC
  *                           (applied identically to ADCEnum and SearchMC)
  * @param chooseMaxIntersection ADCEnum's uncovered-set choice (Fig. 10)
  * @param naiveEvidence      use the AFASTDC-style evidence builder
  * @param searchMc           use the SearchMC baseline enumerator
  */
final case class MinerConfig(
    fName: String = "f1",
    epsilon: Double = 0.01,
    sampleFraction: Double = 1.0,
    alpha: Double = 0.05,
    overlapThreshold: Double = 0.3,
    seed: Long = 42L,
    maxDcSize: Int = Int.MaxValue,
    chooseMaxIntersection: Boolean = true,
    naiveEvidence: Boolean = false,
    searchMc: Boolean = false,
)

/** Result of a run: canonical minimal ADCs plus per-stage wall times. */
final case class MinerResult(
    dcs: Vector[DenialConstraint],
    hittingSets: Vector[Set[Int]],
    space: PredicateSpace,
    evidence: Evidence,
    sampleRows: Int,
    spaceMs: Long,
    evidenceMs: Long,
    enumMs: Long,
    enumNodes: Long,
) {
  def totalMs: Long = spaceMs + evidenceMs + enumMs
}

/** ADCMiner (Fig. 1): predicate space generator → sampler → evidence set
  * constructor → enumeration. The pair-quadratic evidence construction and
  * the predicate-space profiling run distributed; the enumeration runs on
  * the driver over the collected evidence set.
  */
object AdcMiner {

  private def timed[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1000000L)
  }

  def mine(spark: SparkSession, df: DataFrame, cfg: MinerConfig): MinerResult = {
    val (space, spaceMs) = timed(PredicateSpace.build(df, cfg.overlapThreshold))
    val sampled = Sampler.sample(df, cfg.sampleFraction, cfg.seed)
    mineWithSpace(spark, sampled, space, cfg, spaceMs)
  }

  /** Variant reusing a prebuilt predicate space (sweeps over sample sizes
    * or thresholds profile the full relation once, as the paper does).
    */
  def mineWithSpace(
      spark: SparkSession,
      sampled: DataFrame,
      space: PredicateSpace,
      cfg: MinerConfig,
      spaceMs: Long = 0L): MinerResult = {
    val rel = EncodedRelation.fromDataFrame(sampled)
    val needVios = ApproxFunction.needsVios(cfg.fName)
    val (evidence, evidenceMs) = timed {
      if (cfg.naiveEvidence) {
        val ev = NaiveEvidenceBuilder.build(spark, rel, space)
        if (needVios) // naive builder has no vios pass; reuse the fast one
          ev.copy(vios = EvidenceBuilder.build(spark, rel, space, needVios = true).vios)
        else ev
      } else EvidenceBuilder.build(spark, rel, space, needVios)
    }
    mineFromEvidence(evidence, space, cfg, spaceMs, evidenceMs, rel.n)
  }

  /** Enumeration-only stage, reusing a prebuilt evidence set. */
  def mineFromEvidence(
      evidence: Evidence,
      space: PredicateSpace,
      cfg: MinerConfig,
      spaceMs: Long = 0L,
      evidenceMs: Long = 0L,
      sampleRows: Int = -1): MinerResult = {
    val fn = ApproxFunction(cfg.fName, evidence, cfg.epsilon, cfg.alpha)
    val ((hss, nodes), enumMs) = timed {
      if (cfg.searchMc) {
        val e = new SearchMC(evidence.masks, evidence.counts, evidence.nPreds,
          space.groupOf, fn, cfg.epsilon, cfg.maxDcSize)
        (e.enumerate(), e.nodes)
      } else {
        val e = new AdcEnum(evidence.masks, evidence.counts, evidence.nPreds,
          space.groupOf, fn, cfg.epsilon, cfg.chooseMaxIntersection, cfg.maxDcSize)
        (e.enumerate(), e.nodes)
      }
    }
    val dcs = DenialConstraint.distinctCanonical(hss.map(space.dcFromHittingSet))
    MinerResult(dcs, hss, space, evidence,
      if (sampleRows >= 0) sampleRows else evidence.nTuples,
      spaceMs, evidenceMs, enumMs, nodes)
  }
}
