package repro.core

import scala.collection.mutable.ArrayBuffer

/** ADCEnum (Figs. 4/5): enumeration of all minimal approximate hitting sets
  * of the evidence set w.r.t. a valid approximation function f and threshold
  * ε — equivalently, of all nontrivial minimal ADCs.
  *
  * Extends MMCS with:
  *  - the approximate base case (g(S) ≤ ε) plus the explicit IsMinimal check;
  *  - a second "do not hit F" recursive branch, guarded by the canHit marks
  *    (UpdateCanCover) and the WillCover feasibility prune;
  *  - removal of same-group predicates from the candidate list after adding
  *    a predicate (RemoveRedundantPreds), which also guarantees nontrivial
  *    output DCs;
  *  - selection of the uncovered class with the *maximal* candidate
  *    intersection (Sec. 6; `chooseMaxIntersection = false` reverts to
  *    Murakami–Uno's minimal choice for the Fig. 10 experiment).
  *
  * All state is mutable with exact undo (dancing-links uncov list, crit
  * lists with cached pair weights, candidate bitmask), so one instance runs
  * one enumeration; results are hitting sets over predicate indices.
  */
final class AdcEnum(
    masks: Array[Array[Long]],
    counts: Array[Long],
    nPreds: Int,
    groupOf: Array[Int],
    fn: ApproxFunction,
    epsilon: Double,
    chooseMaxIntersection: Boolean = true,
    maxSize: Int = Int.MaxValue,
) {

  def this(ev: Evidence, space: PredicateSpace, fn: ApproxFunction, epsilon: Double) =
    this(ev.masks, ev.counts, ev.nPreds, space.groupOf, fn, epsilon)

  private val nClasses = masks.length
  private val nWords = Bits.words(math.max(1, nPreds))
  private val groupMembers: Array[Array[Int]] = {
    val nGroups = if (groupOf.isEmpty) 0 else groupOf.max + 1
    val buf = Array.fill(nGroups)(ArrayBuffer.empty[Int])
    (0 until nPreds).foreach(p => buf(groupOf(p)) += p)
    buf.map(_.toArray)
  }

  // ---- mutable search state -------------------------------------------------
  // uncov: doubly-linked list over class ids, sentinel = nClasses.
  private val nxt = new Array[Int](nClasses + 1)
  private val prv = new Array[Int](nClasses + 1)
  private var uncovWeight = 0L
  private val canHit = Array.fill(nClasses)(true)
  private val inCand = Array.fill(nPreds)(true)
  private val candMask = new Array[Long](nWords)
  private val s = ArrayBuffer.empty[Int] // current hitting set
  private val critList = Array.fill(nPreds)(ArrayBuffer.empty[Int])
  private val critWeight = new Array[Long](nPreds)

  /** Recursion nodes visited — reported in the experiments. */
  var nodes: Long = 0L

  private def initState(): Unit = {
    val sentinel = nClasses
    var prev = sentinel
    var c = 0
    while (c < nClasses) { nxt(prev) = c; prv(c) = prev; prev = c; c += 1 }
    nxt(prev) = sentinel; prv(sentinel) = prev
    uncovWeight = counts.sum
    java.util.Arrays.fill(candMask, 0L)
    (0 until nPreds).foreach { p => inCand(p) = true; Bits.set(candMask, p) }
  }

  private def uncovForeach(f: Int => Unit): Unit = {
    var c = nxt(nClasses)
    while (c != nClasses) { f(c); c = nxt(c) }
  }

  private def uncovIterator: Iterator[Int] = new Iterator[Int] {
    private var c = nxt(nClasses)
    def hasNext: Boolean = c != nClasses
    def next(): Int = { val r = c; c = nxt(c); r }
  }

  private def unlink(c: Int): Unit = {
    nxt(prv(c)) = nxt(c); prv(nxt(c)) = prv(c); uncovWeight -= counts(c)
  }
  private def relink(c: Int): Unit = { // restore in reverse unlink order
    nxt(prv(c)) = c; prv(nxt(c)) = c; uncovWeight += counts(c)
  }

  private def dropCand(p: Int): Unit = { inCand(p) = false; Bits.clear(candMask, p) }
  private def addCand(p: Int): Unit = { inCand(p) = true; Bits.set(candMask, p) }

  // ---- approximation-function plumbing -------------------------------------
  private def gCurrent(): Double =
    if (fn.pairBased) fn.gFromPairWeight(uncovWeight) else fn.g(uncovIterator)

  /** g of the DC obtained by dropping e from S: violating classes are the
    * current uncov plus the classes for which e is critical.
    */
  private def gWithout(e: Int): Double =
    if (fn.pairBased) fn.gFromPairWeight(uncovWeight + critWeight(e))
    else fn.g(uncovIterator ++ critList(e).iterator)

  /** WillCover (Fig. 5): g of S ∪ cand. After UpdateCanCover, a class is
    * unreachable by any candidate exactly when canHit is false.
    */
  private def gWillCover(): Double =
    if (fn.pairBased) {
      var w = 0L
      uncovForeach(c => if (!canHit(c)) w += counts(c))
      fn.gFromPairWeight(w)
    } else fn.g(uncovIterator.filter(c => !canHit(c)))

  /** IsMinimal (Fig. 5): S minus any single predicate must exceed ε
    * (monotonicity makes single-removal sufficient).
    */
  private def isMinimal(): Boolean = s.forall(e => gWithout(e) > epsilon)

  // ---- subroutines ----------------------------------------------------------
  /** UpdateCritUncov (Fig. 3): move classes containing e from uncov to
    * crit[e]; strip classes containing e from every crit[u], u ∈ S.
    * Returns undo information.
    */
  private def updateCritUncov(e: Int): (Array[Int], ArrayBuffer[(Int, Int)]) = {
    val buf = critList(e) // empty on entry: e is not in S
    uncovForeach { c => if (Bits.contains(masks(c), e)) buf += c }
    // The unlink order must be recorded immutably: deeper recursion may
    // reorder critList(e) through its strip/restore cycles, and the
    // dancing-links undo must relink in exact reverse unlink order.
    val moved = buf.toArray
    var k = 0
    while (k < moved.length) {
      val c = moved(k); unlink(c); critWeight(e) += counts(c); k += 1
    }
    val removedFromCrit = ArrayBuffer.empty[(Int, Int)]
    s.foreach { u =>
      val lst = critList(u)
      var i = 0
      while (i < lst.length) {
        val c = lst(i)
        if (Bits.contains(masks(c), e)) {
          removedFromCrit += ((u, c))
          critWeight(u) -= counts(c)
          lst(i) = lst(lst.length - 1); lst.remove(lst.length - 1)
        } else i += 1
      }
    }
    (moved, removedFromCrit)
  }

  private def undoCritUncov(e: Int, undo: (Array[Int], ArrayBuffer[(Int, Int)])): Unit = {
    val (moved, removedFromCrit) = undo
    var i = removedFromCrit.length - 1
    while (i >= 0) {
      val (u, c) = removedFromCrit(i)
      critList(u) += c; critWeight(u) += counts(c); i -= 1
    }
    val buf = critList(e)
    require(buf.length == moved.length,
      s"crit[$e] mutated below recursion: ${buf.length} vs ${moved.length}")
    i = moved.length - 1
    while (i >= 0) { val c = moved(i); relink(c); critWeight(e) -= counts(c); i -= 1 }
    buf.clear()
  }

  /** UpdateCanCover (Fig. 5): mark every still-uncovered class with no
    * remaining candidate predicate as unhittable. Returns flipped classes.
    */
  private def updateCanCover(): ArrayBuffer[Int] = {
    val flipped = ArrayBuffer.empty[Int]
    uncovForeach { c =>
      if (canHit(c) && !Bits.intersects(masks(c), candMask)) {
        canHit(c) = false; flipped += c
      }
    }
    flipped
  }

  /** Choose F ∈ uncov with canHit and a non-empty candidate intersection;
    * maximal (default) or minimal intersection size. Returns -1 when no
    * candidate can hit any remaining uncovered class — then no extension of
    * S reduces the violation set, so the branch is exhausted.
    */
  private def chooseClass(): Int = {
    var best = -1
    var bestScore = if (chooseMaxIntersection) 0 else Int.MaxValue
    uncovForeach { c =>
      if (canHit(c)) {
        val sc = Bits.popcountAnd(masks(c), candMask)
        if (sc > 0) {
          val better = if (chooseMaxIntersection) sc > bestScore else sc < bestScore
          if (better) { best = c; bestScore = sc }
        }
      }
    }
    best
  }

  // ---- main recursion (Fig. 4) ---------------------------------------------
  private val results = Vector.newBuilder[Set[Int]]

  private def rec(): Unit = {
    nodes += 1
    if (gCurrent() <= epsilon) {
      // Base case: S is an approximate hitting set. Monotonicity makes every
      // proper superset non-minimal, so the branch ends here either way.
      if (isMinimal()) results += s.toSet
      return
    }
    if (s.length >= maxSize) return
    val fCls = chooseClass()
    if (fCls == -1) return
    val fMask = masks(fCls)

    // ---- branch 1: do not hit F (lines 7-12) ----
    val removed = ArrayBuffer.empty[Int]
    var p = 0
    while (p < nPreds) {
      if (inCand(p) && Bits.contains(fMask, p)) { dropCand(p); removed += p }
      p += 1
    }
    val flipped = updateCanCover()
    if (gWillCover() <= epsilon) rec()
    flipped.foreach(canHit(_) = true)
    removed.foreach(addCand)

    // ---- branch 2: hit F (lines 13-22) ----
    val cList = removed.toArray // cand ∩ F, in index order
    cList.foreach(dropCand)
    val failed = ArrayBuffer.empty[Int]
    cList.foreach { e =>
      val undo = updateCritUncov(e)
      val critOk = critList(e).nonEmpty && s.forall(u => critList(u).nonEmpty)
      if (critOk) {
        // RemoveRedundantPreds: same-group predicates would make the DC
        // trivial or redundant (indifference to redundancy).
        val redundant = groupMembers(groupOf(e)).filter(q => q != e && inCand(q))
        redundant.foreach(dropCand)
        s += e
        rec()
        s.remove(s.length - 1)
        redundant.foreach(addCand)
        addCand(e)
      } else failed += e
      undoCritUncov(e, undo)
    }
    failed.foreach(addCand)
  }

  /** Run the enumeration; returns every minimal approximate hitting set
    * exactly once (Thm. 6.1).
    */
  def enumerate(): Vector[Set[Int]] = {
    nodes = 0L
    initState()
    rec()
    results.result()
  }
}
