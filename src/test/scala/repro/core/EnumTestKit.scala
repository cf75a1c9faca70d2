package repro.core

/** Helpers for enumeration tests: abstract evidence sets built directly from
  * predicate-index sets, and a brute-force reference enumeration of minimal
  * approximate hitting sets (restricted, like ADCEnum, to at most one
  * predicate per group — the paper's nontriviality/redundancy rule).
  */
object EnumTestKit {

  def mkMasks(nPreds: Int, classes: Seq[Set[Int]]): Array[Array[Long]] =
    classes.map { s =>
      val m = new Array[Long](Bits.words(math.max(1, nPreds)))
      s.foreach(Bits.set(m, _))
      m
    }.toArray

  def mkEvidence(nPreds: Int, classes: Seq[(Set[Int], Long)], nTuples: Int): Evidence =
    Evidence(nPreds, mkMasks(nPreds, classes.map(_._1)), classes.map(_._2).toArray,
      nTuples, None)

  /** Identity groups: every predicate its own group (no redundancy pruning). */
  def soloGroups(nPreds: Int): Array[Int] = Array.tabulate(nPreds)(identity)

  /** Brute-force minimal approximate hitting sets of size <= maxSize, with
    * at most one predicate per group, w.r.t. fn and epsilon. Exponential —
    * keep nPreds small or maxSize tiny.
    */
  def bruteMinimalApprox(
      nPreds: Int,
      classes: IndexedSeq[Set[Int]],
      counts: IndexedSeq[Long],
      groups: IndexedSeq[Int],
      fn: ApproxFunction,
      epsilon: Double,
      maxSize: Int = Int.MaxValue): Set[Set[Int]] = {

    def g(s: Set[Int]): Double =
      fn.g(classes.indices.iterator.filter(c => (classes(c) & s).isEmpty))

    def onedPerGroup(s: Set[Int]): Boolean =
      s.groupBy(groups(_)).forall(_._2.size == 1)

    val candidates =
      (0 until nPreds).toSet.subsets()
        .filter(s => s.size <= maxSize && onedPerGroup(s))
        .filter(s => g(s) <= epsilon)
        .toVector
    // Monotone g: minimality == every single-element removal exceeds epsilon.
    candidates.filter(s => s.forall(e => g(s - e) > epsilon)).toSet
  }

  /** Violation count of hitting set `hs` over abstract classes. */
  def violations(classes: IndexedSeq[Set[Int]], counts: IndexedSeq[Long], hs: Set[Int]): Long =
    classes.indices.filter(c => (classes(c) & hs).isEmpty).map(counts(_)).sum

  /** Build evidence (with vios) from explicit ordered tuple pairs: each
    * entry is ((i, j), Sat(i, j)). Groups equal masks into classes exactly
    * like the distributed builders do.
    */
  def evidenceFromPairs(
      nPreds: Int,
      nTuples: Int,
      pairs: Seq[((Int, Int), Set[Int])]): Evidence = {
    val byMask = pairs.groupBy(_._2).toVector.sortBy(_._1.toSeq.sorted.mkString(","))
    val masks = mkMasks(nPreds, byMask.map(_._1))
    val counts = byMask.map(_._2.size.toLong).toArray
    val vios = byMask.map { case (_, ps) =>
      val perTid = scala.collection.mutable.HashMap.empty[Int, Long]
      ps.foreach { case ((i, j), _) =>
        perTid(i) = perTid.getOrElse(i, 0L) + 1L
        perTid(j) = perTid.getOrElse(j, 0L) + 1L
      }
      perTid.toArray.sortBy(_._1).map { case (t, c) => Evidence.pack(t, c) }
    }.toArray
    Evidence(nPreds, masks, counts, nTuples, Some(vios))
  }

  /** Reference g2: fraction of tuples involved in a violating pair. */
  def refG2(pairs: Seq[((Int, Int), Set[Int])], hs: Set[Int], nTuples: Int): Double = {
    val bad = pairs.filter { case (_, sat) => (sat & hs).isEmpty }
    bad.flatMap { case ((i, j), _) => Seq(i, j) }.distinct.size.toDouble / nTuples
  }

  /** Reference exact g3: minimum tuples to delete so no violating pair
    * remains (exact minimum vertex cover by brute force — tiny inputs only).
    */
  def refG3Exact(pairs: Seq[((Int, Int), Set[Int])], hs: Set[Int], nTuples: Int): Double = {
    val bad = pairs.collect { case ((i, j), sat) if (sat & hs).isEmpty => (i, j) }
    if (bad.isEmpty) return 0.0
    val verts = bad.flatMap(p => Seq(p._1, p._2)).distinct
    val best = verts.toSet.subsets()
      .filter(rm => bad.forall(p => rm(p._1) || rm(p._2)))
      .map(_.size).min
    best.toDouble / nTuples
  }
}
