package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class OpSpec extends AnyFunSuite {

  test("all six operators present, ids consistent") {
    assert(Op.all.size == 6)
    Op.all.foreach(op => assert(Op.byId(op.id) == op))
    assert(Op.all.map(_.id).distinct.size == 6)
  }

  test("equality subset") {
    assert(Op.equality == Vector(Op.Eq, Op.Neq))
    assert(Op.equality.forall(!_.isOrder))
    assert((Op.all.toSet -- Op.equality.toSet).forall(_.isOrder))
  }

  test("complement is an involution") {
    Op.all.foreach(op => assert(op.complement.complement == op))
  }

  test("inverse is an involution") {
    Op.all.foreach(op => assert(op.inverse.inverse == op))
  }

  test("expected complements") {
    assert(Op.Eq.complement == Op.Neq)
    assert(Op.Lt.complement == Op.Geq)
    assert(Op.Gt.complement == Op.Leq)
    assert(Op.Leq.complement == Op.Gt)
    assert(Op.Geq.complement == Op.Lt)
    assert(Op.Neq.complement == Op.Eq)
  }

  test("expected inverses") {
    assert(Op.Eq.inverse == Op.Eq)
    assert(Op.Neq.inverse == Op.Neq)
    assert(Op.Lt.inverse == Op.Gt)
    assert(Op.Leq.inverse == Op.Geq)
    assert(Op.Gt.inverse == Op.Lt)
    assert(Op.Geq.inverse == Op.Leq)
  }

  test("evalCmp matches the three-way comparison semantics") {
    for (c <- Seq(-5, -1, 0, 1, 7)) {
      assert(Op.Eq.evalCmp(c) == (c == 0))
      assert(Op.Neq.evalCmp(c) == (c != 0))
      assert(Op.Lt.evalCmp(c) == (c < 0))
      assert(Op.Leq.evalCmp(c) == (c <= 0))
      assert(Op.Gt.evalCmp(c) == (c > 0))
      assert(Op.Geq.evalCmp(c) == (c >= 0))
    }
  }

  test("exactly one of op/complement holds for every comparison result") {
    val rnd = new Random(1)
    (0 until 500).foreach { _ =>
      val c = rnd.nextInt()
      Op.all.foreach(op => assert(op.evalCmp(c) != op.complement.evalCmp(c)))
    }
  }

  test("inverse mirrors operand swap") {
    val rnd = new Random(2)
    (0 until 500).foreach { _ =>
      val x = rnd.nextInt(20); val y = rnd.nextInt(20)
      val c = Integer.compare(x, y)
      val ci = Integer.compare(y, x)
      Op.all.foreach(op => assert(op.evalCmp(c) == op.inverse.evalCmp(ci)))
    }
  }
}
