package repro.core

/** Rule model: denial constraints as evaluated by the paper.
  *
  * Two concrete families are supported, matching §3/§4 of the paper:
  *
  *  - [[Fd]] — functional dependencies `lhs → rhs` (a DC of the form
  *    ∀t1,t2 ¬(t1.lhs = t2.lhs ∧ t1.rhs ≠ t2.rhs)). `lhs` may span
  *    multiple attributes (the air-quality rule), `rhs` is a single
  *    attribute (multi-attribute rhs decomposes into multiple FDs, §4.1).
  *  - [[InequalityDc]] — general two-tuple DCs whose atoms compare the
  *    same attribute of both tuples with an inequality, e.g.
  *    ∀t1,t2 ¬(t1.salary < t2.salary ∧ t1.tax > t2.tax). The paper
  *    focuses on this "more realistic" same-attribute case (§4.2).
  */
sealed trait Rule {
  /** Stable identifier used for provenance and checked-tuple bookkeeping. */
  def id: String

  /** All attributes the rule constrains. */
  def attrs: Seq[String]

  /** True iff the rule can affect a query touching `queryAttrs`
    * (projection ∪ where-clause attributes), per §4.1:
    * (X ∪ Y) ∩ (P ∪ W) ≠ ∅.
    */
  def overlaps(queryAttrs: Seq[String]): Boolean =
    attrs.exists(queryAttrs.contains)
}

/** Functional dependency `lhs → rhs`. */
final case class Fd(id: String, lhs: Seq[String], rhs: String) extends Rule {
  require(lhs.nonEmpty, s"FD $id needs a non-empty lhs")
  require(!lhs.contains(rhs), s"FD $id rhs must not appear in lhs")
  override def attrs: Seq[String] = lhs :+ rhs
}

object Fd {
  /** Convenience constructor for the common single-attribute lhs. */
  def apply(id: String, lhs: String, rhs: String): Fd = Fd(id, Seq(lhs), rhs)
}

/** One atom `t1.attr op t2.attr` of an inequality DC. */
final case class Atom(attr: String, op: String) {
  require(Atom.Ops.contains(op), s"unsupported atom op '$op'")

  /** Evaluates the atom on concrete numeric values. */
  def eval(v1: Double, v2: Double): Boolean = op match {
    case "<"  => v1 < v2
    case "<=" => v1 <= v2
    case ">"  => v1 > v2
    case ">=" => v1 >= v2
  }

  /** The op a candidate fix of the *t1*-side value must satisfy to
    * invert this atom: ¬(v1 < v2) ⇒ v1 ≥ v2 (the paper's Example 5
    * uses the strict form of the inverted bound, e.g. "<2000").
    */
  def invertedOpT1: String = op match {
    case "<" | "<=" => ">"
    case ">" | ">=" => "<"
  }

  /** Same for the *t2*-side value: ¬(v1 < v2) via t2 ⇒ v2 ≤ v1. */
  def invertedOpT2: String = op match {
    case "<" | "<=" => "<"
    case ">" | ">=" => ">"
  }
}

object Atom {
  val Ops: Set[String] = Set("<", "<=", ">", ">=")
}

/** Two-tuple denial constraint ∀t1,t2 ¬(atom1 ∧ atom2 ∧ …) with
  * inequality atoms over numeric attributes.
  */
final case class InequalityDc(id: String, atoms: Seq[Atom]) extends Rule {
  require(atoms.nonEmpty, s"DC $id needs at least one atom")
  override def attrs: Seq[String] = atoms.map(_.attr).distinct

  /** True iff the ordered pair (t1, t2) violates the constraint,
    * i.e. every atom holds.
    */
  def violates(t1: Map[String, Double], t2: Map[String, Double]): Boolean =
    atoms.forall(a => a.eval(t1(a.attr), t2(a.attr)))
}
