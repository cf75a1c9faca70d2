package repro.core

import org.apache.spark.sql.SparkSession
import scala.collection.immutable.ArraySeq
import scala.collection.mutable

/** One comparison shared by all predicates over an operand pair: a single
  * three-way compare of (colA from sideA, colB from sideB) decides every
  * operator bit in `predIdx`/`ops` at once.
  */
final case class EvalGroup(
    colA: Int, sideA: Int,
    colB: Int, sideB: Int,
    opIds: Array[Int],
    predIdx: Array[Int],
) extends Serializable {
  def isSameTuple: Boolean = sideA == sideB
}

/** Distributed evidence-set construction (Sec. 4.2, component 3).
  *
  * This is the reproduction's stand-in for DCFinder's [37] evidence builder:
  * the pair-quadratic scan is parallelised over row ranges (RDD
  * mapPartitions against the broadcast columnar relation), comparisons are
  * shared per attribute pair, single-tuple predicate bits are precomputed
  * once per tuple, and per-partition hash aggregation plus a `reduceByKey`
  * produce the distinct-mask bag.
  */
object EvidenceBuilder {

  /** Derive the shared-comparison groups of a predicate space. */
  def evalGroups(space: PredicateSpace): Array[EvalGroup] =
    space.groupMembers.map { members =>
      val p0 = space.predicates(members(0))
      EvalGroup(
        p0.a.col, p0.a.side, p0.b.col, p0.b.side,
        members.map(i => space.predicates(i).op.id),
        members)
    }

  /** Bits of the single-tuple groups on the given side, per tuple. */
  private def baseMasks(
      rel: EncodedRelation,
      groups: Array[EvalGroup],
      side: Int,
      nWords: Int): Array[Array[Long]] = {
    val same = groups.filter(g => g.isSameTuple && g.sideA == side)
    Array.tabulate(rel.n) { i =>
      val m = new Array[Long](nWords)
      var gi = 0
      while (gi < same.length) {
        val g = same(gi)
        val c = rel.cmp(g.colA, i, g.colB, i)
        var k = 0
        while (k < g.opIds.length) {
          if (Op.byId(g.opIds(k)).evalCmp(c)) Bits.set(m, g.predIdx(k))
          k += 1
        }
        gi += 1
      }
      m
    }
  }

  /** Build Evi(D) for the encoded relation. With `needVios`, a second
    * distributed pass aggregates per-(class, tuple) pair counts for f2/f3.
    */
  def build(
      spark: SparkSession,
      rel: EncodedRelation,
      space: PredicateSpace,
      needVios: Boolean = false,
      slices: Int = 0): Evidence = {
    val n = rel.n
    val nWords = Bits.words(space.size)
    val groups = evalGroups(space)
    val cross = groups.filter(!_.isSameTuple)
    val base0 = baseMasks(rel, groups, 0, nWords)
    val base1 = baseMasks(rel, groups, 1, nWords)

    val sc = spark.sparkContext
    val nSlices = if (slices > 0) slices else math.max(1, math.min(n, sc.defaultParallelism * 4))
    val bRel = sc.broadcast(rel)
    val bCross = sc.broadcast(cross)
    val bBase0 = sc.broadcast(base0)
    val bBase1 = sc.broadcast(base1)

    def maskFor(r: EncodedRelation, cg: Array[EvalGroup], b0: Array[Array[Long]],
                b1: Array[Array[Long]], i: Int, j: Int, scratch: Array[Long]): Unit = {
      val bi = b0(i); val bj = b1(j)
      var w = 0
      while (w < scratch.length) { scratch(w) = bi(w) | bj(w); w += 1 }
      var gi = 0
      while (gi < cg.length) {
        val g = cg(gi)
        val ri = if (g.sideA == 0) i else j
        val rj = if (g.sideB == 0) i else j
        val c = r.cmp(g.colA, ri, g.colB, rj)
        var k = 0
        while (k < g.opIds.length) {
          if (Op.byId(g.opIds(k)).evalCmp(c)) Bits.set(scratch, g.predIdx(k))
          k += 1
        }
        gi += 1
      }
    }

    val classCounts: Array[(ArraySeq[Long], Long)] = sc
      .parallelize(0 until n, nSlices)
      .mapPartitions { it =>
        val r = bRel.value; val cg = bCross.value
        val b0 = bBase0.value; val b1 = bBase1.value
        val acc = mutable.HashMap.empty[ArraySeq[Long], Long]
        val scratch = new Array[Long](nWords)
        it.foreach { i =>
          var j = 0
          while (j < r.n) {
            if (j != i) {
              maskFor(r, cg, b0, b1, i, j, scratch)
              val probe = ArraySeq.unsafeWrapArray(scratch)
              acc.get(probe) match {
                case Some(cnt) => acc.update(probe, cnt + 1L)
                case None => acc.update(ArraySeq.unsafeWrapArray(scratch.clone()), 1L)
              }
            }
            j += 1
          }
        }
        acc.iterator
      }
      .reduceByKey(_ + _)
      .collect()

    val masks = classCounts.map(_._1.toArray)
    val counts = classCounts.map(_._2)

    val vios: Option[Array[Array[Long]]] =
      if (!needVios) None
      else {
        val classIdx: Map[ArraySeq[Long], Int] =
          classCounts.iterator.map(_._1).zipWithIndex.toMap
        val bIdx = sc.broadcast(classIdx)
        val perClassTuple: Array[(Long, Long)] = sc
          .parallelize(0 until n, nSlices)
          .mapPartitions { it =>
            val r = bRel.value; val cg = bCross.value
            val b0 = bBase0.value; val b1 = bBase1.value
            val idx = bIdx.value
            val acc = mutable.HashMap.empty[Long, Long]
            val scratch = new Array[Long](nWords)
            it.foreach { i =>
              var j = 0
              while (j < r.n) {
                if (j != i) {
                  maskFor(r, cg, b0, b1, i, j, scratch)
                  val cls = idx(ArraySeq.unsafeWrapArray(scratch))
                  // the ordered pair (i, j) involves both endpoints
                  val ki = (cls.toLong << 32) | i.toLong
                  val kj = (cls.toLong << 32) | j.toLong
                  acc.update(ki, acc.getOrElse(ki, 0L) + 1L)
                  acc.update(kj, acc.getOrElse(kj, 0L) + 1L)
                }
                j += 1
              }
            }
            acc.iterator
          }
          .reduceByKey(_ + _)
          .collect()
        val perClass = Array.fill(masks.length)(Vector.newBuilder[Long])
        perClassTuple.foreach { case (key, cnt) =>
          val cls = (key >>> 32).toInt
          val tid = (key & 0xffffffffL).toInt
          perClass(cls) += Evidence.pack(tid, cnt)
        }
        Some(perClass.map(_.result().toArray))
      }

    bRel.destroy(); bCross.destroy(); bBase0.destroy(); bBase1.destroy()
    Evidence(space.size, masks, counts, n, vios)
  }
}
