package repro.core

/** N-ary CEP operators (Section 2.1 of the paper). */
sealed trait NaryOp extends Serializable
case object SEQ extends NaryOp
case object AND extends NaryOp
case object OR extends NaryOp

/** Comparison operators used by pairwise predicates.
  *
  * Every predicate in this reproduction is pairwise (the paper assumes the same,
  * §2.1) and refers to two pattern elements by their positional index.
  */
sealed trait PredOp extends Serializable

/** `e_i.ts < e_j.ts` — temporal constraint produced by the SEQ→AND rewrite (§5.1). */
case object TsLess extends PredOp

/** `e_j.serial == e_i.serial + 1` — strict-contiguity constraint (§6.2). */
case object SerialSucc extends PredOp

/** `e_i.attr(attr) + shift < e_j.attr(attr)` (or `>` when `less=false`).
  *
  * This is the stock-pattern predicate family of §7.2
  * (`m.difference < g.difference`), generalized with a shift so the generator can
  * dial in target selectivities in the paper's 0.002..0.88 range.
  */
final case class AttrCmp(attr: Int, shift: Double, less: Boolean) extends PredOp

/** A pairwise predicate between pattern elements `i` and `j` (positional indices). */
final case class Pred(i: Int, j: Int, op: PredOp) extends Serializable {
  require(i != j, s"pairwise predicate must reference two distinct elements, got ($i,$j)")
  /** The same predicate with element indices remapped (used by DNF/negation splits). */
  def remap(f: Int => Int): Pred = Pred(f(i), f(j), op)
}

/** One primitive-event slot of a pattern: an event type plus optional unary operator.
  *
  * @param typeId  id of the event type in the input stream (a stock symbol id)
  * @param name    human-readable type name
  * @param negated NOT operator applied (§5.3)
  * @param kleene  KL operator applied (§5.2)
  */
final case class Elem(typeId: Int, name: String, negated: Boolean = false, kleene: Boolean = false)
    extends Serializable {
  require(!(negated && kleene), "NOT(KL(e)) is not a simple pattern (§2.1)")
}

/** A *simple* pattern: one n-ary operator (SEQ or AND here; OR is handled by
  * [[Pattern]]/DNF), at most one unary operator per element, pairwise predicates,
  * and a time window (§2.1).
  *
  * Element indices used by `preds` refer to positions in `elems`.
  */
final case class SimplePattern(op: NaryOp, elems: Vector[Elem], preds: Vector[Pred], window: Double)
    extends Serializable {
  require(op != OR, "SimplePattern holds a conjunctive/sequence pattern; use Pattern for OR")
  require(window > 0, "window must be positive")
  require(elems.map(_.typeId).distinct.size == elems.size,
    "every element must have a distinct event type (well-defined-type assumption, §2.1)")
  preds.foreach { p =>
    require(p.i >= 0 && p.i < elems.size && p.j >= 0 && p.j < elems.size,
      s"predicate $p references an element outside 0..${elems.size - 1}")
  }

  def size: Int = elems.size
  def isPure: Boolean = elems.forall(e => !e.negated && !e.kleene)
  def positives: Vector[Elem] = elems.filterNot(_.negated)
}

/** Nested pattern AST (§5.4): leaves are elements, internal nodes carry SEQ/AND/OR.
  * Predicates refer to leaf positions in left-to-right (in-order) traversal.
  */
sealed trait PatternNode extends Serializable {
  /** Leaves in left-to-right order. */
  def leaves: Vector[Elem] = this match {
    case LeafNode(e)       => Vector(e)
    case OpNode(_, childs) => childs.flatMap(_.leaves)
  }
}
final case class LeafNode(elem: Elem) extends PatternNode
final case class OpNode(op: NaryOp, children: Vector[PatternNode]) extends PatternNode {
  require(children.nonEmpty, "operator node needs children")
}

/** A (possibly nested) CEP pattern: AST + global pairwise predicates + window. */
final case class Pattern(root: PatternNode, preds: Vector[Pred], window: Double) extends Serializable {
  def leaves: Vector[Elem] = root.leaves
}

object Pattern {
  /** Convenience: wrap a simple pattern. */
  def simple(p: SimplePattern): Pattern =
    Pattern(OpNode(p.op, p.elems.map(LeafNode(_))), p.preds, p.window)
}
