package repro.core

/** A comparison operator from the DC operator set B = {=, !=, <, <=, >, >=}.
  *
  * Each operator knows its complement (the operator satisfied exactly when
  * this one is not: = / !=, < / >=, > / <=) and its inverse (the operator
  * obtained by swapping the two operands: < / >, <= / >=, =/!= self-inverse).
  * Operators evaluate against a three-way comparison result so a tuple-pair
  * comparison is computed once per attribute pair and shared by all six.
  */
sealed abstract class Op(val sym: String, val id: Int) extends Serializable {

  /** Operator satisfied by exactly the pairs this one is not satisfied by. */
  def complement: Op

  /** Operator equivalent to this one with the operands swapped. */
  def inverse: Op

  /** True iff the operator holds for a value pair with compare result `cmp`
    * (negative: left < right, zero: equal, positive: left > right).
    */
  def evalCmp(cmp: Int): Boolean

  /** Order operators (<, <=, >, >=) apply only to numeric attributes. */
  def isOrder: Boolean = this != Op.Eq && this != Op.Neq

  override def toString: String = sym
}

object Op {
  case object Eq extends Op("=", 0) {
    def complement: Op = Neq; def inverse: Op = Eq
    def evalCmp(cmp: Int): Boolean = cmp == 0
  }
  case object Neq extends Op("!=", 1) {
    def complement: Op = Eq; def inverse: Op = Neq
    def evalCmp(cmp: Int): Boolean = cmp != 0
  }
  case object Lt extends Op("<", 2) {
    def complement: Op = Geq; def inverse: Op = Gt
    def evalCmp(cmp: Int): Boolean = cmp < 0
  }
  case object Leq extends Op("<=", 3) {
    def complement: Op = Gt; def inverse: Op = Geq
    def evalCmp(cmp: Int): Boolean = cmp <= 0
  }
  case object Gt extends Op(">", 4) {
    def complement: Op = Leq; def inverse: Op = Lt
    def evalCmp(cmp: Int): Boolean = cmp > 0
  }
  case object Geq extends Op(">=", 5) {
    def complement: Op = Lt; def inverse: Op = Leq
    def evalCmp(cmp: Int): Boolean = cmp >= 0
  }

  /** All six operators — the set used for numeric attribute pairs. */
  val all: Vector[Op] = Vector(Eq, Neq, Lt, Leq, Gt, Geq)

  /** Equality operators — the set used for string attribute pairs. */
  val equality: Vector[Op] = Vector(Eq, Neq)

  def byId(id: Int): Op = all(id)
}
