package repro.core

/** Murakami–Uno's MMCS algorithm for enumerating all minimal hitting sets of
  * a hypergraph (Fig. 3) — the exact base that ADCEnum extends. Kept generic
  * over Int universes so it doubles as a test oracle for ADCEnum at ε = 0
  * and is usable outside constraint discovery.
  */
object Mmcs {

  /** All minimal hitting sets of `sets` over universe {0, …, nElems−1}.
    * Sets must be non-empty (an empty set admits no hitting set).
    */
  def enumerate(nElems: Int, sets: IndexedSeq[Set[Int]]): Vector[Set[Int]] = {
    require(sets.forall(_.nonEmpty), "empty set admits no hitting set")
    val out = Vector.newBuilder[Set[Int]]

    def rec(s: Set[Int], cand: Set[Int], uncov: List[Int], crit: Map[Int, Set[Int]]): Unit = {
      if (uncov.isEmpty) { out += s; return }
      // Choose the uncovered set with the largest candidate intersection
      // (the paper's Sec. 6 choice; any choice preserves correctness).
      val fIdx = uncov.maxBy(i => (sets(i) & cand).size)
      val c = (sets(fIdx) & cand).toVector.sorted
      var cand2 = cand -- c
      c.foreach { e =>
        val nowCovered = uncov.filter(i => sets(i)(e))
        val crit2 = crit.map { case (u, ss) => u -> ss.filterNot(i => sets(i)(e)) } +
          (e -> nowCovered.toSet)
        if (crit2.valuesIterator.forall(_.nonEmpty)) {
          rec(s + e, cand2, uncov.filterNot(i => sets(i)(e)), crit2)
          cand2 += e // added back only when the criticality test passed
        }
      }
    }

    rec(Set.empty, (0 until nElems).toSet, sets.indices.toList, Map.empty)
    out.result()
  }

  /** Brute-force minimal hitting sets — exponential; test-only oracle. */
  def bruteForce(nElems: Int, sets: IndexedSeq[Set[Int]]): Set[Set[Int]] = {
    def hits(s: Set[Int]): Boolean = sets.forall(f => (f & s).nonEmpty)
    val all = (0 until nElems).toSet.subsets().filter(hits).toVector
    all.filter(s => !all.exists(o => o != s && o.subsetOf(s))).toSet
  }
}
