package repro.core

/** A valid approximation function (Def. 4.3), exposed to the enumeration as
  * the exception rate g(S_φ) = 1 − f(D, S_φ) of a DC, computed from the set
  * of evidence classes *violating* the DC (classes with empty intersection
  * with the DC's hitting set Ŝ_φ). Monotonicity and indifference to
  * redundancy (Defs. 4.1/4.2) translate to: g depends only on the violating
  * classes and shrinks as fewer classes violate — which is property-tested.
  */
trait ApproxFunction extends Serializable {
  def name: String

  /** Exception rate for a DC violated by exactly the given classes. */
  def g(viol: Iterator[Int]): Double

  /** True when g depends only on the total violating *pair count*, enabling
    * the enumeration's O(1) incremental evaluation (f1-family).
    */
  def pairBased: Boolean = false

  /** Fast path for pair-based functions: g from the violating pair count. */
  def gFromPairWeight(w: Long): Double =
    throw new UnsupportedOperationException(s"$name is not pair-based")
}

/** f1 (Sec. 5): fraction of ordered tuple pairs satisfying the DC; the
  * measure used to define ADCs in AFASTDC/BFASTDC/DCFinder [11, 36, 37].
  */
final class F1(ev: Evidence) extends ApproxFunction {
  val name = "f1"
  private val total = math.max(1L, ev.totalPairs).toDouble
  override def pairBased: Boolean = true
  override def gFromPairWeight(w: Long): Double = w / total
  def g(viol: Iterator[Int]): Double = {
    var w = 0L
    viol.foreach(w += ev.counts(_))
    gFromPairWeight(w)
  }
}

/** f2 (Sec. 5): fraction of tuples involved in no violation; g2 is the
  * fraction of "problematic" tuples. Needs the `vios` structure.
  *
  * Cheap pre-filter via Prop. 5.3's contrapositive: if g1 > 2ε then g2 > ε,
  * so when the violating-pair fraction already exceeds 2ε we return the
  * lower bound g1/2 (> ε) without materialising the tuple set. Exact w.r.t.
  * any threshold comparison against ε.
  */
final class F2(ev: Evidence, epsilonHint: Double = Double.PositiveInfinity)
    extends ApproxFunction {
  val name = "f2"
  private val totalPairs = math.max(1L, ev.totalPairs).toDouble
  private val n = math.max(1, ev.nTuples).toDouble

  def g(viol: Iterator[Int]): Double = {
    val classes = viol.toArray
    var w = 0L
    classes.foreach(w += ev.counts(_))
    if (w == 0L) return 0.0
    val g1 = w / totalPairs
    if (g1 > 2.0 * epsilonHint) return g1 / 2.0 // Prop. 5.3 lower bound
    val seen = new java.util.BitSet(ev.nTuples)
    classes.foreach { c =>
      ev.viosOf(c).foreach(p => seen.set(Evidence.tidOf(p)))
    }
    seen.cardinality() / n
  }
}

/** Greedy replacement for f3 (Fig. 2): sort tuples by the number of
  * violations they participate in, remove greedily until the removed tuples
  * cover the total violation count, and report removed/|D| — a practical
  * surrogate for the NP-hard cardinality-repair measure g3.
  *
  * Two exact-by-thresholding fast paths: Prop. 5.3 (g1 > 2ε ⇒ g3 > ε) and
  * the covering lower bound (each removed tuple covers ≤ 2(|D|−1) ordered
  * pairs, so ≥ u/(2(|D|−1)) removals are needed).
  */
final class GreedyF3(ev: Evidence, epsilonHint: Double = Double.PositiveInfinity)
    extends ApproxFunction {
  val name = "f3"
  private val totalPairs = math.max(1L, ev.totalPairs).toDouble
  private val n = math.max(1, ev.nTuples)

  def g(viol: Iterator[Int]): Double = {
    val classes = viol.toArray
    var u = 0L
    classes.foreach(u += ev.counts(_))
    if (u == 0L) return 0.0
    val g1 = u / totalPairs
    if (g1 > 2.0 * epsilonHint) return g1 / 2.0 // Prop. 5.3 lower bound
    val lb = math.ceil(u / (2.0 * math.max(1, n - 1))) / n
    if (lb > epsilonHint) return lb
    // SortTuples (Fig. 2): v(t) = number of violations t participates in.
    val v = new Array[Long](n)
    classes.foreach { c =>
      ev.viosOf(c).foreach { p => v(Evidence.tidOf(p)) += Evidence.cntOf(p) }
    }
    val order = (0 until n).filter(v(_) > 0L).sortBy(t => -v(t))
    var covered = 0L
    var removed = 0
    val it = order.iterator
    while (covered < u && it.hasNext) {
      covered += v(it.next())
      removed += 1
    }
    removed.toDouble / n
  }
}

/** f1' (Sec. 7.2): the sample acceptance function with the confidence
  * correction — g' = p̂ + z_{1-2α}·sqrt(p̂(1−p̂)/m) over the sample's
  * m = |V_J|(|V_J|−1) ordered pairs. Accepting g' ≤ ε on the sample gives
  * the DC probability ≥ 1−α of being an ADC on the full database at ε.
  */
final class F1Adjusted(ev: Evidence, alpha: Double) extends ApproxFunction {
  val name = "f1adj"
  private val m = math.max(1L, ev.totalPairs).toDouble
  private val z = Stats.zFor(alpha)
  override def pairBased: Boolean = true
  override def gFromPairWeight(w: Long): Double = {
    val pHat = w / m
    pHat + z * math.sqrt(pHat * (1.0 - pHat) / m)
  }
  def g(viol: Iterator[Int]): Double = {
    var w = 0L
    viol.foreach(w += ev.counts(_))
    gFromPairWeight(w)
  }
}

object ApproxFunction {

  /** Factory keyed by the names used throughout the experiments. */
  def apply(name: String, ev: Evidence, epsilon: Double, alpha: Double = 0.05): ApproxFunction =
    name match {
      case "f1"    => new F1(ev)
      case "f2"    => new F2(ev, epsilon)
      case "f3"    => new GreedyF3(ev, epsilon)
      case "f1adj" => new F1Adjusted(ev, alpha)
      case other   => throw new IllegalArgumentException(s"unknown approximation function: $other")
    }

  def needsVios(name: String): Boolean = name == "f2" || name == "f3"
}
