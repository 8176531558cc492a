package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Pattern-class reductions of §5. */
class RewritesSpec extends AnyFunSuite {

  private def elems(n: Int, negAt: Set[Int] = Set.empty, klAt: Set[Int] = Set.empty): Vector[Elem] =
    Vector.tabulate(n)(i => Elem(i, s"T$i", negated = negAt(i), kleene = klAt(i)))

  test("seqToAnd adds all-pairs ts constraints for pure sequences (§5.1)") {
    val sp = SimplePattern(SEQ, elems(4), Vector.empty, 1.0)
    val and = Rewrites.seqToAnd(sp)
    assert(and.op == AND)
    val ts = and.preds.filter(_.op == TsLess)
    assert(ts.size == 6)
    assert(ts.toSet == (for (i <- 0 until 4; j <- i + 1 until 4) yield Pred(i, j, TsLess)).toSet)
  }

  test("seqToAnd keeps existing predicates") {
    val p = Pred(0, 2, AttrCmp(0, 0.1, less = true))
    val and = Rewrites.seqToAnd(SimplePattern(SEQ, elems(3), Vector(p), 1.0))
    assert(and.preds.contains(p))
  }

  test("seqToAnd ties a negated element only to its nearest positive neighbours") {
    // SEQ(A, NOT(B), C, D): B gets ts constraints with A and C only.
    val and = Rewrites.seqToAnd(SimplePattern(SEQ, elems(4, negAt = Set(1)), Vector.empty, 1.0))
    val bPreds = and.preds.filter(p => p.i == 1 || p.j == 1)
    assert(bPreds.toSet == Set(Pred(0, 1, TsLess), Pred(1, 2, TsLess)))
    // positives still fully connected
    val posPreds = and.preds.filterNot(p => p.i == 1 || p.j == 1)
    assert(posPreds.toSet == Set(Pred(0, 2, TsLess), Pred(0, 3, TsLess), Pred(2, 3, TsLess)))
  }

  test("splitNegation remaps positives and produces NegSpecs (§5.3)") {
    val sp = Rewrites.seqToAnd(
      SimplePattern(SEQ, elems(4, negAt = Set(1)),
        Vector(Pred(1, 3, AttrCmp(0, 0.0, less = true))), 1.0))
    val (pos, negs) = Rewrites.splitNegation(sp)
    assert(pos.elems.map(_.typeId) == Vector(0, 2, 3))
    assert(pos.elems.forall(!_.negated))
    assert(negs.size == 1)
    val spec = negs.head
    assert(spec.elem.typeId == 1)
    // predicates of the neg element: attr pred vs (old 3 -> new 2), ts preds vs A (new 0) and C (new 1)
    assert(spec.preds.toSet == Set(
      NegPred(2, AttrCmp(0, 0.0, less = true), negOnLeft = true),
      NegPred(0, TsLess, negOnLeft = false),
      NegPred(1, TsLess, negOnLeft = true),
    ))
    assert(spec.dependsOn == Set(0, 1, 2))
  }

  test("splitNegation on a pattern without negation is the identity") {
    val sp = Rewrites.seqToAnd(SimplePattern(SEQ, elems(3), Vector.empty, 1.0))
    val (pos, negs) = Rewrites.splitNegation(sp)
    assert(pos == sp && negs.isEmpty)
  }

  test("kleeneRate follows 2^{rW}/W and saturates (§5.2)") {
    assert(math.abs(Rewrites.kleeneRate(1.0, 10.0) - math.pow(2, 10) / 10.0) < 1e-9)
    assert(Rewrites.kleeneRate(20.0, 10.0, cap = 1e30) == 1e30) // rW=200 saturates
    // the paper's example: r=5/s, W=10s => 2^50/10
    assert(math.abs(Rewrites.kleeneRate(5.0, 10.0, cap = 1e300) - math.pow(2, 50) / 10.0) < 1.0)
  }

  test("contiguityPreds adds serial adjacency between SEQ neighbours (§6.2)") {
    val sp = Rewrites.contiguityPreds(SimplePattern(SEQ, elems(3), Vector.empty, 1.0))
    assert(sp.preds.toSet == Set(Pred(0, 1, SerialSucc), Pred(1, 2, SerialSucc)))
  }

  test("dnf: AND(A, B, OR(C, D)) yields two conjunctive branches (§5.4)") {
    val root = OpNode(AND, Vector(
      LeafNode(Elem(0, "A")), LeafNode(Elem(1, "B")),
      OpNode(OR, Vector(LeafNode(Elem(2, "C")), LeafNode(Elem(3, "D")))),
    ))
    val branches = Rewrites.dnf(Pattern(root, Vector.empty, 1.0))
    assert(branches.size == 2)
    assert(branches.map(_.elems.map(_.typeId)).toSet == Set(Vector(0, 1, 2), Vector(0, 1, 3)))
    assert(branches.forall(_.op == AND))
  }

  test("dnf: SEQ over an OR produces full ordering constraints per branch") {
    // SEQ(A, OR(B, C), D): branch (A,B,D) must carry ts(A)<ts(B), ts(A)<ts(D), ts(B)<ts(D)
    val root = OpNode(SEQ, Vector(
      LeafNode(Elem(0, "A")),
      OpNode(OR, Vector(LeafNode(Elem(1, "B")), LeafNode(Elem(2, "C")))),
      LeafNode(Elem(3, "D")),
    ))
    val branches = Rewrites.dnf(Pattern(root, Vector.empty, 1.0))
    assert(branches.size == 2)
    branches.foreach { b =>
      assert(b.preds.count(_.op == TsLess) == 3)
      assert(b.preds.toSet == Set(Pred(0, 1, TsLess), Pred(0, 2, TsLess), Pred(1, 2, TsLess)))
    }
  }

  test("dnf: disjunction of three sequences — one branch per disjunct, global preds routed") {
    val mkSeq = (off: Int) => OpNode(SEQ, Vector.tabulate(3)(i => LeafNode(Elem(off + i, s"T${off + i}"))))
    val root = OpNode(OR, Vector(mkSeq(0), mkSeq(3), mkSeq(6)))
    val preds = Vector(
      Pred(0, 2, AttrCmp(0, 0.0, less = true)), // inside branch 0
      Pred(3, 5, AttrCmp(0, 0.1, less = true)), // inside branch 1
      Pred(0, 4, AttrCmp(0, 0.2, less = true)), // spans branches -> dropped everywhere
    )
    val branches = Rewrites.dnf(Pattern(root, preds, 2.0))
    assert(branches.size == 3)
    assert(branches(0).preds.contains(Pred(0, 2, AttrCmp(0, 0.0, less = true))))
    assert(branches(1).preds.contains(Pred(0, 2, AttrCmp(0, 0.1, less = true)))) // remapped 3,5 -> 0,2
    assert(!branches(2).preds.exists(_.op.isInstanceOf[AttrCmp])) // spanning pred dropped
    // each branch: C(3,2)=3 ts constraints
    assert(branches.forall(_.preds.count(_.op == TsLess) == 3))
  }

  test("Planner.lastTemporalElem finds the unique maximum of the ts order") {
    val seq = Rewrites.seqToAnd(SimplePattern(SEQ, elems(4), Vector.empty, 1.0))
    assert(Planner.lastTemporalElem(seq).contains(3))
    val and = SimplePattern(AND, elems(3), Vector.empty, 1.0)
    assert(Planner.lastTemporalElem(and).isEmpty)
    // partial order without unique max: A<B, A<C
    val partial = SimplePattern(AND, elems(3), Vector(Pred(0, 1, TsLess), Pred(0, 2, TsLess)), 1.0)
    assert(Planner.lastTemporalElem(partial).isEmpty)
  }

  test("Planner.buildStats applies the KL rate rewrite and folds selectivities") {
    val sp = SimplePattern(AND, elems(3, klAt = Set(1)),
      Vector(Pred(0, 2, AttrCmp(0, 0.0, less = true))), 2.0)
    val provider = new TestData.ConstProvider(r = 2.0, attrSel = 0.25)
    val st = Planner.buildStats(sp, provider)
    assert(st.rates(0) == 2.0)
    assert(math.abs(st.rates(1) - Rewrites.kleeneRate(2.0, 2.0)) < 1e-9)
    assert(st.sel(0)(2) == 0.25 && st.sel(2)(0) == 0.25)
    assert(st.sel(0)(1) == 1.0)
  }
}
