package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}

/** The predicate space P_R over a relation (Sec. 4.2, component 1).
  *
  * Following Chu et al. [11], the space contains, for every attribute A,
  * the cross-tuple predicates `t[A] op t'[A]`, and for every *comparable*
  * attribute pair (A, B) the same-tuple predicates `t[A] op t[B]`,
  * `t'[A] op t'[B]` and the cross-tuple predicates `t[A] op t'[B]`,
  * `t[B] op t'[A]`. Numeric pairs get all six operators, string pairs only
  * {=, !=}. Two distinct attributes are comparable when they have the same
  * type class and share at least `overlapThreshold` (default 30%, as in
  * [11, 37]) of their distinct values.
  */
final class PredicateSpace(
    val colNames: IndexedSeq[String],
    val colIsNumeric: IndexedSeq[Boolean],
    val predicates: IndexedSeq[Predicate],
) extends Serializable {

  val size: Int = predicates.size

  /** Predicate → index in this space. */
  val indexOf: Map[Predicate, Int] = predicates.zipWithIndex.toMap

  /** Index of each predicate's complement (always present in the space). */
  val complementOf: Array[Int] =
    predicates.map(p => indexOf(p.complement)).toArray

  /** Group id per predicate — predicates over the same operand pair. */
  val groupOf: Array[Int] = {
    val keys = predicates.map(_.groupKey).distinct.zipWithIndex.toMap
    predicates.map(p => keys(p.groupKey)).toArray
  }

  /** Members of each group, by group id. */
  val groupMembers: Array[Array[Int]] = {
    val nGroups = if (groupOf.isEmpty) 0 else groupOf.max + 1
    val buf = Array.fill(nGroups)(Vector.newBuilder[Int])
    predicates.indices.foreach(i => buf(groupOf(i)) += i)
    buf.map(_.result().toArray)
  }

  def pretty(i: Int): String = predicates(i).pretty(colNames)

  /** The DC whose predicate set is the complement of hitting set `hs`. */
  def dcFromHittingSet(hs: Iterable[Int]): DenialConstraint =
    DenialConstraint(hs.map(i => predicates(complementOf(i))).toSet)
}

object PredicateSpace {

  /** Build the predicate space for `df`'s relation. The 30%-common-values
    * profiling step runs as a distributed DataFrame job (explode → self-join
    * on value → aggregate) rather than on the driver.
    */
  def build(df: DataFrame, overlapThreshold: Double = 0.3): PredicateSpace = {
    val fields = df.schema.fields
    val names = fields.map(_.name).toIndexedSeq
    val numeric = fields.map(f => EncodedRelation.isNumericType(f.dataType)).toIndexedSeq
    val k = names.size

    val comparable: Set[(Int, Int)] =
      if (overlapThreshold <= 0.0) {
        (for {
          a <- 0 until k; b <- (a + 1) until k
          if numeric(a) == numeric(b)
        } yield (a, b)).toSet
      } else overlappingPairs(df, numeric, overlapThreshold)

    val preds = Vector.newBuilder[Predicate]
    def opsFor(a: Int, b: Int): Vector[Op] =
      if (numeric(a) && numeric(b)) Op.all else Op.equality

    // Same attribute, cross tuple: always generated.
    for (c <- 0 until k; op <- opsFor(c, c))
      preds += Predicate.normalized(ColRef(0, c), ColRef(1, c), op)

    // Comparable distinct attribute pairs (a < b).
    for ((a, b) <- comparable.toSeq.sorted; op <- opsFor(a, b)) {
      preds += Predicate.normalized(ColRef(0, a), ColRef(0, b), op) // on t
      preds += Predicate.normalized(ColRef(1, a), ColRef(1, b), op) // on t'
      preds += Predicate.normalized(ColRef(0, a), ColRef(1, b), op) // t.A op t'.B
      preds += Predicate.normalized(ColRef(0, b), ColRef(1, a), op) // t.B op t'.A
    }

    new PredicateSpace(names, numeric, preds.result().distinct)
  }

  /** Distinct-value overlap profiling: returns the attribute pairs (a < b)
    * of equal type class whose distinct-value sets share at least
    * `threshold` of the smaller set's values.
    */
  def overlappingPairs(
      df: DataFrame,
      numeric: IndexedSeq[Boolean],
      threshold: Double): Set[(Int, Int)] = {
    val spark = df.sparkSession
    val k = numeric.size
    // One (colIdx, value-as-string) relation over all columns; numeric values
    // normalised through double so 1 and 1.0 match.
    val perCol = (0 until k).map { c =>
      val v =
        if (numeric(c)) F.col(df.columns(c)).cast("double").cast("string")
        else F.col(df.columns(c)).cast("string")
      df.select(F.lit(c).as("c"), v.as("v")).where(F.col("v").isNotNull).distinct()
    }
    val vals = perCol.reduce(_.unionAll(_)).cache()
    try {
      val distinctCounts: Map[Int, Long] =
        vals.groupBy("c").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
      // Group each distinct value's column set and emit column pairs — one
      // shuffle, no self-join needed.
      val common: Map[(Int, Int), Long] = vals
        .groupBy("v")
        .agg(F.collect_set("c").as("cs"))
        .select("cs")
        .rdd
        .flatMap { r =>
          val cs = r.getSeq[Int](0).sorted
          for (i <- cs.indices.iterator; j <- (i + 1) until cs.size)
            yield ((cs(i), cs(j)), 1L)
        }
        .reduceByKey(_ + _)
        .collect()
        .toMap
      // NB: collect on the Map itself would rebuild a Map keyed by `a`,
      // silently dropping pairs that share a first component — iterate.
      common.iterator.collect {
        case ((a, b), shared)
            if numeric(a) == numeric(b) &&
              shared.toDouble / math.max(1L, math.min(distinctCounts(a), distinctCounts(b))) >= threshold =>
          (a, b)
      }.toSet
    } finally {
      vals.unpersist()
      ()
    }
  }
}
