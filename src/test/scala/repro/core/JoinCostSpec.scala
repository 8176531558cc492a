package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The join-side cost functions of §3.2/§4 in isolation. */
class JoinCostSpec extends AnyFunSuite {

  test("Cost_LDJ hand-computed: C1 + two-way join costs") {
    val cards = Vector(10.0, 20.0, 5.0)
    val f = Vector(
      Vector(1.0, 0.1, 1.0),
      Vector(0.1, 1.0, 0.5),
      Vector(1.0, 0.5, 1.0))
    // order 0,1,2: C1=10; C(P1,R2)=10*20*0.1=20; C(P2,R3)=20*5*(1*0.5)=50
    assert(math.abs(JoinCost.ldj(cards, f, Vector(0, 1, 2)) - (10.0 + 20.0 + 50.0)) < 1e-9)
  }

  test("Cost_LDJ includes filter selectivities on the first relation") {
    val cards = Vector(10.0, 4.0)
    val f = Vector(Vector(0.5, 1.0), Vector(1.0, 1.0))
    // C1 = 10*0.5 = 5; C(P1,R2) = 5*4*1 = 20
    assert(math.abs(JoinCost.ldj(cards, f, Vector(0, 1)) - 25.0) < 1e-9)
  }

  test("Cost_BJ hand-computed: leaves + internal node sizes") {
    val cards = Vector(10.0, 20.0, 5.0)
    val f = Vector(
      Vector(1.0, 0.1, 1.0),
      Vector(0.1, 1.0, 0.5),
      Vector(1.0, 0.5, 1.0))
    val t = NodePlan(NodePlan(LeafPlan(0), LeafPlan(1)), LeafPlan(2))
    // leaves 10+20+5; node{0,1}=10*20*0.1=20; root=20*5*(f02*f12)=20*5*0.5=50
    assert(math.abs(JoinCost.bushy(cards, f, t) - (35.0 + 20.0 + 50.0)) < 1e-9)
  }

  test("Cost_BJ is symmetric in children") {
    val rnd = new Random(91)
    for (_ <- 1 to 20) {
      val s = TestData.randomStats(3, rnd)
      val cards = s.rates.map(_ * s.window)
      val a = JoinCost.bushy(cards, s.sel, NodePlan(NodePlan(LeafPlan(0), LeafPlan(1)), LeafPlan(2)))
      val b = JoinCost.bushy(cards, s.sel, NodePlan(LeafPlan(2), NodePlan(LeafPlan(1), LeafPlan(0))))
      assert(math.abs(a - b) < 1e-9 * math.max(1.0, a))
    }
  }

  test("left-deep Cost_BJ of an order equals Cost_LDJ plus non-head leaf cardinalities") {
    val rnd = new Random(92)
    for (_ <- 1 to 20) {
      val n = 3 + rnd.nextInt(3)
      val s = TestData.randomStats(n, rnd)
      val cards = s.rates.map(_ * s.window)
      val order = rnd.shuffle((0 until n).toVector)
      val ld = JoinCost.ldj(cards, s.sel, order)
      val bj = JoinCost.bushy(cards, s.sel, TreePlan.leftDeep(OrderPlan(order)))
      val leafExtra = order.tail.map(i => cards(i) * s.sel(i)(i)).sum
      assert(math.abs(bj - (ld + leafExtra)) < 1e-6 * math.max(1.0, bj))
    }
  }

  test("a selective predicate makes its pair the cheapest first join") {
    val cards = Vector(100.0, 100.0, 100.0)
    val f = Vector(
      Vector(1.0, 1.0, 0.001),
      Vector(1.0, 1.0, 1.0),
      Vector(0.001, 1.0, 1.0))
    val with02 = JoinCost.bushy(cards, f, NodePlan(NodePlan(LeafPlan(0), LeafPlan(2)), LeafPlan(1)))
    val with01 = JoinCost.bushy(cards, f, NodePlan(NodePlan(LeafPlan(0), LeafPlan(1)), LeafPlan(2)))
    assert(with02 < with01)
  }
}
