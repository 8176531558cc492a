package repro.cep

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import EngineTestKit._

/** Event selection strategy semantics in depth (§6.2). */
class StrategySemanticsSpec extends AnyFunSuite {

  private val seq2 = SimplePattern(SEQ, elems(2), Vector.empty, 10.0)
  private val seq3 = SimplePattern(SEQ, elems(3), Vector.empty, 10.0)

  test("next-match: an event never appears in two matches") {
    val rnd = new scala.util.Random(93)
    val s = randomStream(2, 120, 12.0, rnd)
    val r = runNfa(seq2.copy(window = 2.0), Vector(0, 1), s, strategy = NextMatch)
    val used = r.matches.flatMap(_.byElem.flatten)
    assert(used.distinct.size == used.size, "an event was consumed twice")
  }

  test("any-match reuses events freely") {
    val s = Seq(ev(0, 1, 0), ev(1, 2, 1), ev(1, 3, 2))
    val r = runNfa(seq2, Vector(0, 1), s, strategy = AnyMatch)
    assert(r.stats.matches == 2)
    val used = r.matches.flatMap(_.byElem.flatten)
    assert(used.count(_ == 0L) == 2, "the A event should serve both matches")
  }

  test("next-match match count never exceeds any-match count") {
    val rnd = new scala.util.Random(94)
    for (_ <- 1 to 10) {
      val s = randomStream(3, 80, 8.0, rnd)
      val any = runNfa(seq3.copy(window = 2.0), Vector(0, 1, 2), s, strategy = AnyMatch)
      val next = runNfa(seq3.copy(window = 2.0), Vector(0, 1, 2), s, strategy = NextMatch)
      assert(next.stats.matches <= any.stats.matches)
      assert(next.stats.pmCreated <= any.stats.pmCreated)
    }
  }

  test("next-match consumption works under out-of-order plans") {
    val s = Seq(ev(0, 1, 0), ev(0, 2, 1), ev(1, 3, 2))
    for (order <- Vector(Vector(0, 1), Vector(1, 0))) {
      val r = runNfa(seq2, order, s, strategy = NextMatch)
      assert(r.stats.matches == 1, s"order=$order")
    }
  }

  test("contiguity over three elements needs three adjacent serials") {
    val ok = Seq(ev(0, 1, 0), ev(1, 1.1, 1), ev(2, 1.2, 2))
    assert(runNfa(seq3, Vector(0, 1, 2), ok, strategy = Contiguity).stats.matches == 1)
    val broken = Seq(ev(0, 1, 0), ev(1, 1.1, 1), ev(9, 1.15, 2), ev(2, 1.2, 3))
    assert(runNfa(seq3, Vector(0, 1, 2), broken, strategy = Contiguity).stats.matches == 0)
  }

  test("contiguity is consumption-based: overlapping windows yield disjoint matches") {
    val s = Seq(
      ev(0, 1.0, 0), ev(1, 1.1, 1), // match 1
      ev(0, 1.2, 2), ev(1, 1.3, 3), // match 2
    )
    val r = runNfa(seq2, Vector(0, 1), s, strategy = Contiguity)
    assert(r.stats.matches == 2)
  }

  test("tree engine agrees with NFA on strategy-restricted counts for mirror plans") {
    val rnd = new scala.util.Random(95)
    for (strategy <- Seq[Strategy](NextMatch, Contiguity)) {
      val s = randomStream(2, 100, 10.0, rnd)
      val n = runNfa(seq2.copy(window = 1.0), Vector(0, 1), s, strategy = strategy)
      val t = runTree(seq2.copy(window = 1.0), NodePlan(LeafPlan(0), LeafPlan(1)), s, strategy = strategy)
      assert(n.stats.matches == t.stats.matches, s"$strategy")
    }
  }

  test("strategy-aware cost models rank the same stream differently") {
    val stats = Stats.fromPreds(Vector(10.0, 2.0, 8.0), 2.0, Seq((0, 1, 0.2)))
    val any = new CostModel(stats, AnyMatch)
    val next = new CostModel(stats, NextMatch)
    // any-match cost grows multiplicatively, next-match is min-bounded
    assert(any.pm(7) > next.pm(7))
    assert(OrderAlgos.dpLeftDeep(any).order.size == 3)
    assert(OrderAlgos.dpLeftDeep(next).order.size == 3)
  }
}
