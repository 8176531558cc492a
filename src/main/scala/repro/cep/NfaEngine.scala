package repro.cep

import repro.core._
import scala.collection.mutable
import scala.util.control.ControlThrowable

/** Instance-based, out-of-order, order-based evaluation engine — the lazy-NFA
  * mechanism of §2.2 ([28, 29] in the paper), generalized with the §5/§6
  * constructs: Kleene closure (subset semantics), negation checks at the
  * earliest possible plan step, and the three event selection strategies.
  *
  * The engine processes events in timestamp order. Events are buffered per type;
  * a partial match at level `k` binds the first `k` plan positions. An arriving
  * event at plan position `p` extends every live level-`p` partial match, and
  * each newly created partial match immediately tries to bind already-buffered
  * events of subsequent plan positions ("lazy" out-of-order evaluation). Every
  * (partial match × event/subset) combination is considered exactly once: a
  * combination is created when the last-arriving of its constituents arrives.
  *
  * Invariants verified by the test suite: the emitted match set is identical for
  * all n! plans (§2.2), identical to [[TreeEngine]], to the Catalyst join
  * formulation, and to DuckDB.
  */
final class NfaEngine(branch: PlannedBranch, config: EngineConfig = EngineConfig())
    extends CepEngine {
  require(branch.plan.isLeft, "NfaEngine needs an order-based plan")

  private val positive = branch.positive
  private val n = positive.size
  private val W = positive.window
  private val order = branch.plan.swap.getOrElse(sys.error("unreachable")).order
  private val planPos: Array[Int] = {
    val a = Array.fill(n)(-1); order.zipWithIndex.foreach { case (e, p) => a(e) = p }; a
  }
  private val elemAtPos: Array[Int] = order.toArray
  private val kleeneAtPos: Array[Boolean] = order.map(e => positive.elems(e).kleene).toArray
  private val consuming = branch.strategy != AnyMatch

  /** Predicates to verify when binding plan position p: (otherPos, op, curIsLeft). */
  private val predsAt: Array[Array[(Int, PredOp, Boolean)]] = {
    val acc = Array.fill(n)(mutable.ArrayBuffer.empty[(Int, PredOp, Boolean)])
    positive.preds.foreach { case Pred(i, j, op) =>
      val (pi, pj) = (planPos(i), planPos(j))
      if (pi > pj) acc(pi) += ((pj, op, true)) // binding i; bound j is the right side? no:
      else acc(pj) += ((pi, op, false))
    }
    acc.map(_.toArray)
  }
  // NB: curIsLeft refers to the *pattern* sides: Pred(i, j, op) evaluates
  // eval(op, e_i, e_j). When binding position planPos(i) later than planPos(j),
  // the current event takes the i (left) side.

  /** Negation specs grouped by trigger level (= max planPos of deps + 1). */
  private val negByLevel: Array[Array[Int]] = {
    val acc = Array.fill(n + 1)(mutable.ArrayBuffer.empty[Int])
    branch.negs.zipWithIndex.foreach { case (spec, k) =>
      val deps = spec.dependsOn
      val trigger = if (deps.isEmpty) 1 else deps.map(planPos).max + 1
      acc(trigger) += k
    }
    acc.map(_.toArray)
  }
  private val negTypeToSpec: Map[Int, Int] =
    branch.negs.zipWithIndex.map { case (s, k) => s.elem.typeId -> k }.toMap
  private val typeToElem: Map[Int, Int] =
    positive.elems.zipWithIndex.map { case (e, i) => e.typeId -> i }.toMap

  /** A partial match binding plan positions 0..level-1. `bound` holds an Event,
    * or an Array[Event] for a Kleene position.
    */
  private final class Pm(
      val bound: Array[AnyRef],
      val level: Int,
      val minTs: Double,
      val maxTs: Double,
  ) { var dead: Boolean = false }

  // --- mutable run state ---
  private val buffers = Array.fill(n)(mutable.ArrayDeque.empty[Event])
  private val negBuffers = Array.fill(branch.negs.size)(mutable.ArrayDeque.empty[Event])
  private val levels = Array.fill(n)(mutable.ArrayBuffer.empty[Pm]) // index = level, 1..n-1 used
  private val consumed = mutable.HashSet.empty[Long]
  private var now = Double.NegativeInfinity
  private var liveCount = 0L
  private var bufferedCount = 0L
  private var nEvents = 0L
  private var nMatches = 0L
  private var pmCreated = 0L
  private var peakLive = 0L
  private var peakBuffered = 0L
  private var latSum = 0L
  private var tEventStart = 0L
  private var out: mutable.ArrayBuffer[CepMatch] = _
  private var wasCapped = false

  private object Abort extends ControlThrowable

  override def run(events: IndexedSeq[Event]): RunResult = {
    out = mutable.ArrayBuffer.empty[CepMatch]
    val t0 = System.nanoTime()
    try {
      var i = 0
      while (i < events.length) { process(events(i)); i += 1 }
    } catch { case Abort => wasCapped = true }
    val wall = System.nanoTime() - t0
    RunResult(
      RunStats(nEvents, nMatches, pmCreated, peakLive, peakBuffered, wall, latSum),
      out.toVector,
      wasCapped,
    )
  }

  private def process(e: Event): Unit = {
    nEvents += 1
    now = e.ts
    evictBuffers()
    if ((nEvents & 1023) == 0) sweepLevels()
    negTypeToSpec.get(e.typeId) match {
      case Some(k) =>
        negBuffers(k).append(e); bufferedCount += 1
        if (bufferedCount > peakBuffered) peakBuffered = bufferedCount
      case None =>
        typeToElem.get(e.typeId).foreach { elem =>
          buffers(elem).append(e); bufferedCount += 1
          if (bufferedCount > peakBuffered) peakBuffered = bufferedCount
          tEventStart = System.nanoTime()
          val p = planPos(elem)
          if (p == 0) bindAt(null, 0, e)
          else {
            val lvl = levels(p)
            var i = 0
            val sz = lvl.size // snapshot; children land only at higher levels
            while (i < sz) {
              val pm = lvl(i)
              if (!pm.dead && pm.minTs + W >= now) bindAt(pm, p, e)
              i += 1
            }
          }
        }
    }
  }

  /** Bind `e` (and, for Kleene positions, every subset of previously buffered
    * compatible events together with `e`) at plan position `p` of `pm`.
    */
  private def bindAt(pm: Pm, p: Int, e: Event): Unit =
    if (!kleeneAtPos(p)) {
      if (compatSingle(pm, p, e)) spawn(pm, p, e)
    } else {
      kleeneSubsets(pm, p, Some(e)).foreach(sub => spawn(pm, p, sub))
    }

  /** Extend a freshly created partial match with already-buffered events of its
    * next plan position, recursively.
    */
  private def extendForward(pm: Pm, p: Int): Unit =
    if (!kleeneAtPos(p)) {
      val buf = buffers(elemAtPos(p))
      val it = buf.iterator
      while (it.hasNext) {
        val b = it.next()
        if (compatSingle(pm, p, b)) spawn(pm, p, b)
      }
    } else {
      kleeneSubsets(pm, p, None).foreach(sub => spawn(pm, p, sub))
    }

  /** All candidate Kleene bindings at position p: non-empty subsets of buffered
    * compatible events, each including `mustInclude` when given (the
    * newly-arrived event path; buffered-only subsets are produced by the
    * forward path). Buffered events all lie within [now-W, now], so members are
    * pairwise window-compatible by construction.
    */
  private def kleeneSubsets(pm: Pm, p: Int, mustInclude: Option[Event]): Iterator[Array[Event]] = {
    mustInclude match {
      case Some(e) if !compatSingle(pm, p, e) => return Iterator.empty
      case _                                  => ()
    }
    val maxSerial = mustInclude.map(_.serial).getOrElse(Long.MaxValue)
    var base = buffers(elemAtPos(p)).iterator
      .filter(b => b.serial < maxSerial && compatSingle(pm, p, b))
      .toArray
    if (base.length > config.maxKleeneBuffer)
      base = base.takeRight(config.maxKleeneBuffer)
    val k = base.length
    val masks = mustInclude match {
      case Some(_) => Iterator.range(0, 1 << k) // empty subset allowed: {e} alone
      case None    => Iterator.range(1, 1 << k)
    }
    masks.map { m =>
      val members = mutable.ArrayBuffer.empty[Event]
      var i = 0
      while (i < k) { if ((m & (1 << i)) != 0) members += base(i); i += 1 }
      mustInclude.foreach(members += _)
      members.toArray
    }
  }

  /** Window, consumption and predicate compatibility of one candidate event
    * against the bound prefix.
    */
  private def compatSingle(pm: Pm, p: Int, ev: Event): Boolean = {
    if (consuming && consumed.contains(ev.serial)) return false
    if (pm != null && (ev.ts + W < pm.maxTs || ev.ts > pm.minTs + W)) return false
    val preds = predsAt(p)
    var i = 0
    while (i < preds.length) {
      val (otherPos, op, curIsLeft) = preds(i)
      if (pm != null && otherPos < p && otherPos < pm.level) {
        if (!evalAgainst(pm.bound(otherPos), op, ev, curIsLeft)) return false
      }
      i += 1
    }
    true
  }

  private def evalAgainst(boundVal: AnyRef, op: PredOp, ev: Event, curIsLeft: Boolean): Boolean =
    boundVal match {
      case b: Event =>
        if (curIsLeft) PredEval.eval(op, ev, b) else PredEval.eval(op, b, ev)
      case arr: Array[Event] =>
        var i = 0
        while (i < arr.length) {
          val ok = if (curIsLeft) PredEval.eval(op, ev, arr(i)) else PredEval.eval(op, arr(i), ev)
          if (!ok) return false
          i += 1
        }
        true
    }

  /** Create the child partial match, run due negation checks, emit or store+extend. */
  private def spawn(pm: Pm, p: Int, value: AnyRef): Unit = {
    val (vMin, vMax) = value match {
      case e: Event       => (e.ts, e.ts)
      case a: Array[Event] => (a.head.ts, a.last.ts) // buffered in ts order
    }
    val bound = new Array[AnyRef](p + 1)
    if (pm != null) System.arraycopy(pm.bound, 0, bound, 0, p)
    bound(p) = value
    val child = new Pm(
      bound,
      p + 1,
      if (pm == null) vMin else math.min(pm.minTs, vMin),
      if (pm == null) vMax else math.max(pm.maxTs, vMax),
    )
    pmCreated += 1
    if (pmCreated > config.pmCap) throw Abort
    if (!negOk(child)) return
    if (p + 1 == n) emit(child)
    else {
      levels(p + 1) += child
      liveCount += 1
      if (liveCount > peakLive) peakLive = liveCount
      extendForward(child, p + 1)
    }
  }

  /** §5.3: for every negation spec whose dependencies became bound at this
    * level, reject the partial match if a matching negated event exists. Scope:
    * the negated event must satisfy its predicates against the bound
    * dependencies and lie within W of each of them.
    */
  private def negOk(child: Pm): Boolean = {
    val specs = negByLevel(child.level)
    var s = 0
    while (s < specs.length) {
      val k = specs(s)
      val spec = branch.negs(k)
      val it = negBuffers(k).iterator
      while (it.hasNext) {
        val b = it.next()
        if (!(consuming && consumed.contains(b.serial)) && negMatches(spec, child, b)) return false
      }
      s += 1
    }
    true
  }

  private def negMatches(spec: NegSpec, child: Pm, b: Event): Boolean = {
    val deps = spec.dependsOn
    val depOk = deps.forall { d =>
      val pos = planPos(d)
      pos < child.level && (child.bound(pos) match {
        case e: Event        => math.abs(e.ts - b.ts) <= W
        case a: Array[Event] => a.forall(e => math.abs(e.ts - b.ts) <= W)
      })
    }
    if (!depOk) return false
    spec.preds.forall { case NegPred(posIdx, op, negOnLeft) =>
      val pos = planPos(posIdx)
      pos < child.level && evalAgainst(child.bound(pos), op, b, negOnLeft)
    }
  }

  private def emit(child: Pm): Unit = {
    if (consuming) {
      // An earlier emission during this same arrival may have consumed one of
      // our constituents — skip-till-next allows each event in one match only.
      var p = 0
      while (p < n) {
        child.bound(p) match {
          case e: Event        => if (consumed.contains(e.serial)) return
          case a: Array[Event] => if (a.exists(ev => consumed.contains(ev.serial))) return
        }
        p += 1
      }
    }
    nMatches += 1
    latSum += System.nanoTime() - tEventStart
    if (config.collectMatches) {
      val byElem = Vector.tabulate(n) { elem =>
        child.bound(planPos(elem)) match {
          case e: Event        => Vector(e.serial)
          case a: Array[Event] => a.map(_.serial).sorted.toVector
        }
      }
      out += CepMatch(byElem, child.minTs)
    }
    if (consuming) {
      var p = 0
      while (p < n) {
        child.bound(p) match {
          case e: Event        => consumed += e.serial
          case a: Array[Event] => a.foreach(ev => consumed += ev.serial)
        }
        p += 1
      }
      killConsumedPms()
    }
  }

  /** After a consumption event, partial matches holding consumed events die. */
  private def killConsumedPms(): Unit = {
    var lvl = 1
    while (lvl < n) {
      val buf = levels(lvl)
      var i = 0
      while (i < buf.size) {
        val pm = buf(i)
        if (!pm.dead) {
          var p = 0
          var hit = false
          while (p < pm.level && !hit) {
            pm.bound(p) match {
              case e: Event        => hit = consumed.contains(e.serial)
              case a: Array[Event] => hit = a.exists(ev => consumed.contains(ev.serial))
            }
            p += 1
          }
          if (hit) { pm.dead = true; liveCount -= 1 }
        }
        i += 1
      }
      lvl += 1
    }
  }

  private def evictBuffers(): Unit = {
    val cutoff = now - W
    var i = 0
    while (i < n) {
      val buf = buffers(i)
      while (buf.nonEmpty && buf.head.ts < cutoff) { buf.removeHead(); bufferedCount -= 1 }
      i += 1
    }
    var k = 0
    while (k < negBuffers.length) {
      val buf = negBuffers(k)
      while (buf.nonEmpty && buf.head.ts < cutoff) { buf.removeHead(); bufferedCount -= 1 }
      k += 1
    }
  }

  private def sweepLevels(): Unit = {
    val cutoff = now - W
    var lvl = 1
    while (lvl < n) {
      val buf = levels(lvl)
      val before = buf.size
      buf.filterInPlace(pm => !pm.dead && pm.minTs >= cutoff)
      liveCount -= before - buf.size
      lvl += 1
    }
  }
}
