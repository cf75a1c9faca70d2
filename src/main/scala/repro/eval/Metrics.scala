package repro.eval

import repro.core.DenialConstraint

/** Quality metrics of Sec. 8: precision/recall/F1 of sample-mined vs
  * full-mined ADC sets, and G-recall against the golden DCs. All
  * comparisons are over canonical forms (t↔t' renaming quotiented out).
  */
object Metrics {

  final case class Prf(precision: Double, recall: Double, f1: Double)

  def prf(found: Iterable[DenialConstraint], truth: Iterable[DenialConstraint]): Prf = {
    val f = found.map(_.canonical).toSet
    val t = truth.map(_.canonical).toSet
    if (f.isEmpty && t.isEmpty) return Prf(1.0, 1.0, 1.0)
    val hits = (f & t).size.toDouble
    val p = if (f.isEmpty) 0.0 else hits / f.size
    val r = if (t.isEmpty) 0.0 else hits / t.size
    val f1 = if (p + r == 0.0) 0.0 else 2 * p * r / (p + r)
    Prf(p, r, f1)
  }

  /** Fraction of golden DCs present in the discovered set (Sec. 8.4). */
  def gRecall(found: Iterable[DenialConstraint], golden: Iterable[DenialConstraint]): Double = {
    val f = found.map(_.canonical).toSet
    val g = golden.map(_.canonical).toSet
    if (g.isEmpty) 1.0 else (f & g).size.toDouble / g.size
  }
}
