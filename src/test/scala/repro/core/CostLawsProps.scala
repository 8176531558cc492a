package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import org.scalacheck.Prop.forAll

/** ScalaCheck laws for the cost models and planners — properties that must hold
  * for *any* statistics, not just the seeded samples of the unit suites.
  */
object CostLawsProps extends Properties("CostLaws") {

  private val genStats: Gen[Stats] = for {
    n <- Gen.choose(2, 6)
    rates <- Gen.listOfN(n, Gen.choose(0.5, 50.0))
    window <- Gen.choose(0.5, 5.0)
    nPreds <- Gen.choose(0, n * (n - 1) / 2)
    pairs = for (i <- 0 until n; j <- i + 1 until n) yield (i, j)
    chosen <- Gen.pick(math.min(nPreds, pairs.size), pairs)
    sels <- Gen.listOfN(chosen.size, Gen.choose(0.01, 0.99))
  } yield Stats.fromPreds(rates.toVector, window,
    chosen.toSeq.zip(sels).map { case ((i, j), s) => (i, j, s) })

  private val genStatsAndOrder: Gen[(Stats, OrderPlan)] = for {
    s <- genStats
    perm <- Gen.const(scala.util.Random.shuffle((0 until s.n).toVector))
  } yield (s, OrderPlan(perm))

  property("pm is positive on non-empty masks") = forAll(genStats) { s =>
    val cm = new CostModel(s)
    (1 until (1 << s.n)).forall(m => cm.pm(m) > 0.0)
  }

  property("orderCost includes the full-set term") = forAll(genStatsAndOrder) { case (s, o) =>
    val cm = new CostModel(s)
    cm.orderCost(o) >= cm.pm((1 << s.n) - 1) - 1e-9
  }

  property("orderCost is the sum of orderStep increments") = forAll(genStatsAndOrder) {
    case (s, o) =>
      val cm = new CostModel(s)
      var mask = 0
      var acc = 0.0
      o.order.foreach { e => mask |= 1 << e; acc += cm.orderStep(mask, e) }
      math.abs(acc - cm.orderCost(o)) <= 1e-9 * math.max(1.0, acc)
  }

  property("treeCost bounds the sum of leaf PMs from below") = forAll(genStats) { s =>
    val cm = new CostModel(s)
    val tree = TreePlan.leftDeep(OrderPlan((0 until s.n).toVector))
    cm.treeCost(tree) >= (0 until s.n).map(i => cm.pm(1 << i)).sum - 1e-9
  }

  property("DP-LD is never beaten by a random order") = forAll(genStatsAndOrder) { case (s, o) =>
    val cm = new CostModel(s)
    cm.orderCost(OrderAlgos.dpLeftDeep(cm)) <= cm.orderCost(o) + 1e-9
  }

  property("DP-B is never beaten by a random-order left-deep tree") =
    forAll(genStatsAndOrder) { case (s, o) =>
      val cm = new CostModel(s)
      cm.treeCost(TreeAlgos.dpBushy(cm)) <= cm.treeCost(TreePlan.leftDeep(o)) + 1e-9
    }

  property("greedy, II and DP return permutations and DP <= II <= start") =
    forAll(genStats) { s =>
      val cm = new CostModel(s)
      val g = OrderAlgos.greedy(cm)
      val ii = OrderAlgos.iiGreedy(cm)
      val dp = OrderAlgos.dpLeftDeep(cm)
      Prop.all(
        g.order.sorted == (0 until s.n).toVector,
        ii.order.sorted == (0 until s.n).toVector,
        cm.orderCost(ii) <= cm.orderCost(g) + 1e-9,
        cm.orderCost(dp) <= cm.orderCost(ii) + 1e-9,
      )
    }

  property("Theorem 1 identity holds for arbitrary statistics") =
    forAll(genStatsAndOrder) { case (s, o) =>
      val cm = new CostModel(s)
      val cards = (0 until s.n).map(i => s.window * s.rates(i)).toVector
      val a = cm.orderCost(o)
      val b = JoinCost.ldj(cards, s.sel, o.order)
      math.abs(a - b) <= 1e-6 * math.max(1.0, math.max(a, b))
    }

  property("scaling every rate scales pm monotonically") = forAll(genStats) { s =>
    val cm1 = new CostModel(s)
    val cm2 = new CostModel(s.copy(rates = s.rates.map(_ * 2.0)))
    (1 until (1 << s.n)).forall(m => cm2.pm(m) >= cm1.pm(m) - 1e-12)
  }
}
