package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SearchMCSpec extends AnyFunSuite {
  import EnumTestKit._

  private def run(nPreds: Int, classes: Seq[(Set[Int], Long)], epsilon: Double,
                  nTuples: Int = 10, groups: Array[Int] = null,
                  maxSize: Int = Int.MaxValue): Vector[Set[Int]] = {
    val ev = mkEvidence(nPreds, classes, nTuples)
    val g = if (groups == null) soloGroups(nPreds) else groups
    new SearchMC(ev.masks, ev.counts, nPreds, g, new F1(ev), epsilon, maxSize).enumerate()
  }

  test("exact covers on the triangle hypergraph") {
    val classes = Seq(Set(0, 1) -> 1L, Set(1, 2) -> 1L, Set(0, 2) -> 1L)
    assert(run(3, classes, 0.0).toSet == Set(Set(0, 1), Set(1, 2), Set(0, 2)))
  }

  test("approximate base case admits smaller covers") {
    val classes = Seq(Set(0, 1) -> 50L, Set(2) -> 4L)
    assert(run(3, classes, 0.05).toSet == Set(Set(0), Set(1)))
  }

  test("agrees with ADCEnum on 300 random instances") {
    val rnd = new Random(21)
    (0 until 300).foreach { trial =>
      val nPreds = 2 + rnd.nextInt(6)
      val classes = Seq.fill(1 + rnd.nextInt(7)) {
        rnd.shuffle((0 until nPreds).toList).take(1 + rnd.nextInt(nPreds)).toSet ->
          (1L + rnd.nextInt(9))
      }
      val eps = Seq(0.0, 0.01, 0.05, 0.2)(rnd.nextInt(4))
      val groups =
        if (rnd.nextBoolean()) soloGroups(nPreds) else Array.tabulate(nPreds)(_ / 2)
      val ev = mkEvidence(nPreds, classes, 10 + rnd.nextInt(10))
      val a = new AdcEnum(ev.masks, ev.counts, nPreds, groups, new F1(ev), eps).enumerate()
      val b = new SearchMC(ev.masks, ev.counts, nPreds, groups, new F1(ev), eps).enumerate()
      assert(a.toSet == b.toSet, s"trial $trial eps=$eps classes=$classes")
      assert(b.size == b.toSet.size, s"trial $trial: SearchMC duplicates")
    }
  }

  test("agrees with ADCEnum under a size cap") {
    val rnd = new Random(22)
    (0 until 100).foreach { trial =>
      val nPreds = 3 + rnd.nextInt(4)
      val classes = Seq.fill(1 + rnd.nextInt(6)) {
        rnd.shuffle((0 until nPreds).toList).take(1 + rnd.nextInt(nPreds)).toSet ->
          (1L + rnd.nextInt(5))
      }
      val cap = 1 + rnd.nextInt(3)
      val ev = mkEvidence(nPreds, classes, 12)
      val a = new AdcEnum(ev.masks, ev.counts, nPreds, soloGroups(nPreds),
        new F1(ev), 0.05, true, cap).enumerate()
      val b = new SearchMC(ev.masks, ev.counts, nPreds, soloGroups(nPreds),
        new F1(ev), 0.05, cap).enumerate()
      assert(a.toSet == b.toSet, s"trial $trial cap=$cap")
    }
  }
}
