package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MmcsSpec extends AnyFunSuite {

  test("single set: each element is a singleton minimal hitting set") {
    val out = Mmcs.enumerate(4, IndexedSeq(Set(0, 2)))
    assert(out.toSet == Set(Set(0), Set(2)))
  }

  test("two disjoint sets: cross product") {
    val out = Mmcs.enumerate(4, IndexedSeq(Set(0, 1), Set(2, 3)))
    assert(out.toSet == Set(Set(0, 2), Set(0, 3), Set(1, 2), Set(1, 3)))
  }

  test("nested sets: inner set dominates") {
    val out = Mmcs.enumerate(3, IndexedSeq(Set(0, 1, 2), Set(0, 1)))
    assert(out.toSet == Set(Set(0), Set(1)))
  }

  test("classic triangle hypergraph") {
    val out = Mmcs.enumerate(3, IndexedSeq(Set(0, 1), Set(1, 2), Set(0, 2)))
    assert(out.toSet == Set(Set(0, 1), Set(1, 2), Set(0, 2)))
  }

  test("returns each minimal hitting set exactly once") {
    val sets = IndexedSeq(Set(0, 1, 2), Set(1, 3), Set(2, 3), Set(0, 3))
    val out = Mmcs.enumerate(4, sets)
    assert(out.size == out.toSet.size)
    assert(out.toSet == Mmcs.bruteForce(4, sets))
  }

  test("matches brute force on 200 random hypergraphs") {
    val rnd = new Random(7)
    (0 until 200).foreach { trial =>
      val nElems = 2 + rnd.nextInt(7)
      val nSets = 1 + rnd.nextInt(6)
      val sets = IndexedSeq.fill(nSets) {
        val size = 1 + rnd.nextInt(nElems)
        rnd.shuffle((0 until nElems).toList).take(size).toSet
      }
      val got = Mmcs.enumerate(nElems, sets)
      val want = Mmcs.bruteForce(nElems, sets)
      assert(got.toSet == want, s"trial $trial: sets=$sets")
      assert(got.size == got.toSet.size, s"trial $trial produced duplicates")
    }
  }

  test("empty hypergraph has the empty hitting set") {
    assert(Mmcs.enumerate(3, IndexedSeq.empty).toSet == Set(Set.empty[Int]))
  }

  test("empty member set is rejected") {
    intercept[IllegalArgumentException](Mmcs.enumerate(3, IndexedSeq(Set.empty[Int])))
  }
}
