package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class AdcEnumSpec extends AnyFunSuite {
  import EnumTestKit._

  private def run(
      nPreds: Int,
      classes: Seq[(Set[Int], Long)],
      epsilon: Double,
      nTuples: Int = 10,
      groups: Array[Int] = null,
      chooseMax: Boolean = true,
      maxSize: Int = Int.MaxValue): Vector[Set[Int]] = {
    val ev = mkEvidence(nPreds, classes, nTuples)
    val g = if (groups == null) soloGroups(nPreds) else groups
    new AdcEnum(ev.masks, ev.counts, nPreds, g, new F1(ev), epsilon,
      chooseMax, maxSize).enumerate()
  }

  test("epsilon 0 reduces to exact minimal hitting sets") {
    val classes = Seq(Set(0, 1) -> 3L, Set(1, 2) -> 2L, Set(0, 2) -> 4L)
    val got = run(3, classes, 0.0).toSet
    assert(got == Set(Set(0, 1), Set(1, 2), Set(0, 2)))
  }

  test("nonzero epsilon admits smaller sets") {
    // 10 tuples -> 90 ordered pairs. Class {2} has weight 4 <= eps*90.
    val classes = Seq(Set(0, 1) -> 50L, Set(2) -> 4L)
    val got = run(3, classes, 0.05, nTuples = 10).toSet
    // {0} and {1} leave class {2} uncovered: 4/90 = 0.044 <= 0.05.
    assert(got == Set(Set(0), Set(1)))
  }

  test("the empty set is returned when everything is within epsilon") {
    val classes = Seq(Set(0) -> 1L)
    val got = run(2, classes, 0.5, nTuples = 10).toSet
    assert(got == Set(Set.empty[Int]))
  }

  test("sets avoiding the first-chosen class are still found (skip branch)") {
    // Force the situation that breaks naive base-case-modified MMCS: a
    // minimal approximate hitting set that misses a heavy-covered class.
    // Classes: A={0} (weight 5), B={1} (weight 5), 90 pairs, eps=0.06.
    // {0} leaves B violated (5/90=0.055<=eps) and {1} leaves A violated.
    val classes = Seq(Set(0) -> 5L, Set(1) -> 5L)
    val got = run(2, classes, 0.06, nTuples = 10).toSet
    assert(got == Set(Set(0), Set(1)))
  }

  test("every returned set is exactly once (no duplicates)") {
    val classes = Seq(Set(0, 1, 2) -> 10L, Set(1, 3) -> 5L, Set(2, 3) -> 5L, Set(0, 3) -> 7L)
    val got = run(4, classes, 0.1, nTuples = 20)
    assert(got.size == got.toSet.size)
  }

  test("group restriction: at most one predicate per group in any output") {
    val groups = Array(0, 0, 1, 1)
    val classes = Seq(Set(0, 2) -> 8L, Set(1, 3) -> 8L, Set(0, 3) -> 8L, Set(1, 2) -> 8L)
    val got = run(4, classes, 0.0, groups = groups).toSet
    got.foreach(s => assert(s.groupBy(groups(_)).forall(_._2.size == 1), s"bad set $s"))
    assert(got == bruteMinimalApprox(4, classes.map(_._1).toIndexedSeq,
      classes.map(_._2).toIndexedSeq, groups.toIndexedSeq,
      new F1(mkEvidence(4, classes, 10)), 0.0))
  }

  test("matches brute force on 300 random instances (f1, varying epsilon)") {
    val rnd = new Random(11)
    (0 until 300).foreach { trial =>
      val nPreds = 2 + rnd.nextInt(6)
      val nClasses = 1 + rnd.nextInt(8)
      val classes = Seq.fill(nClasses) {
        val sz = 1 + rnd.nextInt(nPreds)
        rnd.shuffle((0 until nPreds).toList).take(sz).toSet -> (1L + rnd.nextInt(9))
      }
      val nTuples = 10 + rnd.nextInt(10)
      val epsilon = Seq(0.0, 0.01, 0.05, 0.2)(rnd.nextInt(4))
      val groups =
        if (rnd.nextBoolean()) soloGroups(nPreds)
        else Array.tabulate(nPreds)(_ / 2)
      val ev = mkEvidence(nPreds, classes, nTuples)
      val got = new AdcEnum(ev.masks, ev.counts, nPreds, groups,
        new F1(ev), epsilon).enumerate()
      val want = bruteMinimalApprox(nPreds, classes.map(_._1).toIndexedSeq,
        classes.map(_._2).toIndexedSeq, groups.toIndexedSeq, new F1(ev), epsilon)
      assert(got.toSet == want,
        s"trial $trial: eps=$epsilon groups=${groups.toSeq} classes=$classes")
      assert(got.size == got.toSet.size, s"trial $trial produced duplicates")
    }
  }

  test("min-intersection choice yields the same result set") {
    val rnd = new Random(12)
    (0 until 100).foreach { trial =>
      val nPreds = 2 + rnd.nextInt(5)
      val nClasses = 1 + rnd.nextInt(7)
      val classes = Seq.fill(nClasses) {
        rnd.shuffle((0 until nPreds).toList).take(1 + rnd.nextInt(nPreds)).toSet ->
          (1L + rnd.nextInt(5))
      }
      val eps = Seq(0.0, 0.03, 0.1)(rnd.nextInt(3))
      val a = run(nPreds, classes, eps, nTuples = 12, chooseMax = true).toSet
      val b = run(nPreds, classes, eps, nTuples = 12, chooseMax = false).toSet
      assert(a == b, s"trial $trial")
    }
  }

  test("maxSize caps output to minimal ADCs of bounded size") {
    val rnd = new Random(13)
    (0 until 100).foreach { trial =>
      val nPreds = 3 + rnd.nextInt(4)
      val classes = Seq.fill(1 + rnd.nextInt(6)) {
        rnd.shuffle((0 until nPreds).toList).take(1 + rnd.nextInt(nPreds)).toSet ->
          (1L + rnd.nextInt(5))
      }
      val eps = Seq(0.0, 0.05)(rnd.nextInt(2))
      val cap = 1 + rnd.nextInt(2)
      val got = run(nPreds, classes, eps, nTuples = 12, maxSize = cap).toSet
      val want = bruteMinimalApprox(nPreds, classes.map(_._1).toIndexedSeq,
        classes.map(_._2).toIndexedSeq, soloGroups(nPreds).toIndexedSeq,
        new F1(mkEvidence(nPreds, classes, 12)), eps, maxSize = cap)
      assert(got == want, s"trial $trial cap=$cap classes=$classes")
    }
  }

  test("agrees with generic MMCS at epsilon 0 on random hypergraphs") {
    val rnd = new Random(14)
    (0 until 100).foreach { trial =>
      val nPreds = 2 + rnd.nextInt(6)
      val classes = Seq.fill(1 + rnd.nextInt(6)) {
        rnd.shuffle((0 until nPreds).toList).take(1 + rnd.nextInt(nPreds)).toSet -> 1L
      }
      val got = run(nPreds, classes, 0.0).toSet
      val want = Mmcs.enumerate(nPreds, classes.map(_._1).toIndexedSeq).toSet
      assert(got == want, s"trial $trial")
    }
  }
}
