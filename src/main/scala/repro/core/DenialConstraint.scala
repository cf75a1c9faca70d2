package repro.core

/** A denial constraint ∀t,t' ¬(P1 ∧ … ∧ Pm), identified with its predicate
  * set S_φ (Sec. 3). Mining produces DCs as complements of approximate
  * hitting sets of the evidence set.
  *
  * Since the evidence set ranges over all *ordered* tuple pairs, a DC and
  * its t↔t' renaming are semantically identical and are both enumerated;
  * [[canonical]] picks a deterministic representative so output sets and
  * metric comparisons are duplicate-free.
  */
final case class DenialConstraint(preds: Set[Predicate]) extends Serializable {

  def size: Int = preds.size

  /** The same DC with tuple variables t and t' swapped. */
  def swapTuples: DenialConstraint = DenialConstraint(preds.map(_.swapTuples))

  private def key: Seq[(Int, Int, Int, Int, Int)] =
    preds.toSeq.map(_.sortKey).sorted

  /** Deterministic representative of {this, swapTuples}. */
  def canonical: DenialConstraint = {
    val sw = swapTuples
    import Ordering.Implicits._
    if (key <= sw.key) this else sw
  }

  def pretty(colNames: IndexedSeq[String]): String =
    "not(" + preds.toSeq.sorted.map(_.pretty(colNames)).mkString(" and ") + ")"

  override def toString: String =
    "not(" + preds.toSeq.sorted.mkString(" and ") + ")"
}

object DenialConstraint {

  /** Deduplicate a DC collection up to t↔t' renaming. */
  def distinctCanonical(dcs: Iterable[DenialConstraint]): Vector[DenialConstraint] =
    dcs.map(_.canonical).toSet.toVector
      .sortBy((dc: DenialConstraint) => dc.preds.toSeq.sorted.map(_.toString).mkString(","))
}
