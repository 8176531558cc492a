package repro.cep

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import EngineTestKit._
import scala.util.Random

/** Cross-engine equivalence: under skip-till-any the NFA engine (any order) and
  * the tree engine (any tree) must emit the same match set — four independent
  * detection paths per pattern in total once Spark joins and DuckDB are added
  * by the spark suites.
  */
class EngineEquivalenceSpec extends AnyFunSuite {

  private def randomPattern(rnd: Random, n: Int, withNeg: Boolean, withKl: Boolean): SimplePattern = {
    val negAt = if (withNeg && n >= 3) Set(1 + rnd.nextInt(n - 2)) else Set.empty[Int]
    val free = (0 until n).filterNot(negAt)
    val klAt: Set[Int] =
      if (withKl) Set(free(rnd.nextInt(free.size))) else Set.empty[Int]
    val es = elems(n, negAt = negAt, klAt = klAt)
    val nPreds = rnd.nextInt(n)
    val pairs = rnd.shuffle((for (i <- 0 until n; j <- i + 1 until n) yield (i, j)).toVector).take(nPreds)
    val preds = pairs.map { case (i, j) =>
      Pred(i, j, AttrCmp(0, (rnd.nextDouble() - 0.5) * 2, less = rnd.nextBoolean()))
    }
    // Negation is defined for sequence patterns (§5.3: the negated event is
    // bounded by its SEQ neighbours); in a pure AND there is no temporal bound
    // on the negated event and "check at the earliest point" would depend on
    // the plan. The workload generator follows the same rule.
    val op = if (withNeg || rnd.nextBoolean()) SEQ else AND
    SimplePattern(op, es, preds, window = 1.5)
  }

  test("random patterns: all NFA orders and all trees agree on the match set") {
    val rnd = new Random(41)
    for (iter <- 1 to 25) {
      val n = 2 + rnd.nextInt(3)
      val sp = randomPattern(rnd, n, withNeg = false, withKl = false)
      val s = randomStream(n + 1, 60, 6.0, rnd)
      val ref = matchSet(runNfa(sp, (0 until n).toVector, s))
      for (order <- (0 until n).toVector.permutations)
        assert(matchSet(runNfa(sp, order, s)) == ref, s"iter=$iter order=$order sp=$sp")
      for (t <- TreePlan.enumerate((0 until n).toVector))
        assert(matchSet(runTree(sp, t, s)) == ref, s"iter=$iter tree=$t sp=$sp")
    }
  }

  test("random negation patterns: NFA and tree engines agree") {
    val rnd = new Random(42)
    for (iter <- 1 to 15) {
      val n = 3 + rnd.nextInt(2)
      val sp = randomPattern(rnd, n, withNeg = true, withKl = false)
      val s = randomStream(n + 1, 60, 6.0, rnd)
      val posN = n - 1
      val ref = matchSet(runNfa(sp, (0 until posN).toVector, s))
      for (order <- (0 until posN).toVector.permutations)
        assert(matchSet(runNfa(sp, order, s)) == ref, s"iter=$iter order=$order")
      for (t <- TreePlan.enumerate((0 until posN).toVector))
        assert(matchSet(runTree(sp, t, s)) == ref, s"iter=$iter tree=$t")
    }
  }

  test("random Kleene patterns: NFA and tree engines agree") {
    val rnd = new Random(43)
    for (iter <- 1 to 15) {
      val n = 2 + rnd.nextInt(2)
      val sp = randomPattern(rnd, n, withNeg = false, withKl = true)
      val s = randomStream(n + 1, 40, 8.0, rnd) // sparse: KL buffers stay small
      val ref = matchSet(runNfa(sp, (0 until n).toVector, s))
      assert(ref == matchSet(runNfa(sp, (0 until n).reverse.toVector, s)), s"iter=$iter")
      for (t <- TreePlan.enumerate((0 until n).toVector))
        assert(matchSet(runTree(sp, t, s)) == ref, s"iter=$iter tree=$t")
    }
  }

  test("next-match strategy: NFA match count equals tree count on its mirror plan") {
    // Consumption order depends on discovery order, which both engines share
    // when the tree is the left-deep mirror of the NFA order and events arrive
    // in timestamp order.
    val rnd = new Random(44)
    for (_ <- 1 to 10) {
      val n = 2 + rnd.nextInt(2)
      val sp = randomPattern(rnd, n, withNeg = false, withKl = false)
      val s = randomStream(n + 1, 60, 6.0, rnd)
      val order = rnd.shuffle((0 until n).toVector)
      val a = runNfa(sp, order, s, strategy = NextMatch).stats.matches
      val b = runTree(sp, TreePlan.leftDeep(OrderPlan(order)), s, strategy = NextMatch).stats.matches
      assert(a == b)
    }
  }

  test("match counts are invariant across engines on denser streams") {
    val rnd = new Random(45)
    val sp = SimplePattern(SEQ, elems(4), Vector(Pred(0, 3, AttrCmp(0, 0.0, less = true))), 1.0)
    val s = randomStream(5, 400, 20.0, rnd)
    val counts = (
      (0 until 4).toVector.permutations.take(6).map(o => runNfa(sp, o, s).stats.matches) ++
        TreePlan.enumerate((0 until 4).toVector).take(6).map(t => runTree(sp, t, s).stats.matches)
    ).toSet
    assert(counts.size == 1)
  }
}
