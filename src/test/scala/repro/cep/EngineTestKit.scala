package repro.cep

import repro.core._
import scala.util.Random

/** Helpers shared by the engine test suites: hand-built streams and planned
  * branches with explicit plans.
  */
object EngineTestKit {

  val provider = new repro.core.TestData.ConstProvider()

  def ev(typeId: Int, ts: Double, serial: Long, diff: Double = 0.0): Event =
    Event(typeId, ts, serial, Array(diff, 100.0))

  def elems(n: Int, negAt: Set[Int] = Set.empty, klAt: Set[Int] = Set.empty): Vector[Elem] =
    Vector.tabulate(n)(i => Elem(i, s"T$i", negated = negAt(i), kleene = klAt(i)))

  /** Normalize a simple pattern and attach an explicit order plan. */
  def orderBranch(
      sp: SimplePattern,
      order: Vector[Int],
      strategy: Strategy = AnyMatch,
  ): PlannedBranch = {
    val sp1 = if (strategy == Contiguity && sp.op == SEQ) Rewrites.contiguityPreds(sp) else sp
    val (pos, negs) = Rewrites.splitNegation(Rewrites.seqToAnd(sp1))
    val stats = Planner.buildStats(pos, provider)
    PlannedBranch(pos, negs, stats, strategy, 0.0, Planner.lastTemporalElem(pos),
      Left(OrderPlan(order)), 0.0, 0L)
  }

  /** Normalize a simple pattern and attach an explicit tree plan. */
  def treeBranch(
      sp: SimplePattern,
      tree: TreePlan,
      strategy: Strategy = AnyMatch,
  ): PlannedBranch = {
    val sp1 = if (strategy == Contiguity && sp.op == SEQ) Rewrites.contiguityPreds(sp) else sp
    val (pos, negs) = Rewrites.splitNegation(Rewrites.seqToAnd(sp1))
    val stats = Planner.buildStats(pos, provider)
    PlannedBranch(pos, negs, stats, strategy, 0.0, Planner.lastTemporalElem(pos),
      Right(tree), 0.0, 0L)
  }

  def runNfa(sp: SimplePattern, order: Vector[Int], events: Seq[Event],
             strategy: Strategy = AnyMatch, config: EngineConfig = EngineConfig()): RunResult =
    new NfaEngine(orderBranch(sp, order, strategy), config).run(events.toIndexedSeq)

  def runTree(sp: SimplePattern, tree: TreePlan, events: Seq[Event],
              strategy: Strategy = AnyMatch, config: EngineConfig = EngineConfig()): RunResult =
    new TreeEngine(treeBranch(sp, tree, strategy), config).run(events.toIndexedSeq)

  def matchSet(r: RunResult): Set[Vector[Vector[Long]]] = r.matches.map(_.byElem).toSet

  /** Random stream of `count` events over `nTypes` types in [0, horizon]. */
  def randomStream(nTypes: Int, count: Int, horizon: Double, rnd: Random): Vector[Event] =
    Vector.tabulate(count) { i => (rnd.nextInt(nTypes), rnd.nextDouble() * horizon, rnd.nextGaussian()) }
      .sortBy(_._2)
      .zipWithIndex
      .map { case ((t, ts, d), serial) => ev(t, ts, serial.toLong, d) }
}
