package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class MetricsSpec extends AnyFunSuite {

  private def dc(ps: (Int, Int, Op, Int, Int)*): DenialConstraint =
    DenialConstraint(ps.map { case (sa, ca, op, sb, cb) =>
      Predicate.normalized(ColRef(sa, ca), ColRef(sb, cb), op)
    }.toSet)

  private val a = dc((0, 0, Op.Eq, 1, 0))
  private val b = dc((0, 1, Op.Eq, 1, 1), (0, 2, Op.Neq, 1, 2))
  private val c = dc((0, 0, Op.Lt, 0, 1))

  test("perfect match") {
    val m = Metrics.prf(Seq(a, b), Seq(a, b))
    assert(m.precision == 1.0 && m.recall == 1.0 && m.f1 == 1.0)
  }

  test("half precision, full recall") {
    val m = Metrics.prf(Seq(a, b), Seq(a))
    assert(m.precision == 0.5 && m.recall == 1.0)
    assert(math.abs(m.f1 - 2.0 / 3) < 1e-12)
  }

  test("no overlap") {
    val m = Metrics.prf(Seq(a), Seq(b))
    assert(m.precision == 0.0 && m.recall == 0.0 && m.f1 == 0.0)
  }

  test("empty both sides is perfect") {
    val m = Metrics.prf(Nil, Nil)
    assert(m.f1 == 1.0)
  }

  test("empty found side") {
    val m = Metrics.prf(Nil, Seq(a))
    assert(m.precision == 0.0 && m.recall == 0.0 && m.f1 == 0.0)
  }

  test("comparison is canonical: swapped twins count as hits") {
    val m = Metrics.prf(Seq(c.swapTuples), Seq(c))
    assert(m.f1 == 1.0)
  }

  test("gRecall counts golden fraction found") {
    assert(Metrics.gRecall(Seq(a, b), Seq(a, b, c)) == 2.0 / 3)
    assert(Metrics.gRecall(Seq(a, b, c), Seq(a)) == 1.0)
    assert(Metrics.gRecall(Nil, Seq(a)) == 0.0)
    assert(Metrics.gRecall(Seq(c.swapTuples), Seq(c)) == 1.0)
  }

  test("gRecall of empty golden set is 1") {
    assert(Metrics.gRecall(Seq(a), Nil) == 1.0)
  }
}
