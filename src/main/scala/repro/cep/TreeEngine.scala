package repro.cep

import repro.core._
import scala.collection.mutable
import scala.util.control.ControlThrowable

/** Instance-based tree evaluation engine — ZStream (§2.3) modified, as in the
  * paper, to support arbitrary time windows: every arriving event creates a
  * leaf instance, which recursively combines with instances buffered at its
  * sibling subtree; instances reaching the root are full matches.
  *
  * Exactly-once: a pair of sibling instances is combined when the later of the
  * two is created, so every cross combination is produced exactly once.
  * Supports the same Kleene/negation/selection-strategy semantics as
  * [[NfaEngine]]; the two engines must emit identical match sets under
  * skip-till-any (verified by tests).
  */
final class TreeEngine(branch: PlannedBranch, config: EngineConfig = EngineConfig())
    extends CepEngine {
  require(branch.plan.isRight, "TreeEngine needs a tree-based plan")

  private val positive = branch.positive
  private val n = positive.size
  private val W = positive.window
  private val consuming = branch.strategy != AnyMatch

  // --- static tree wiring -------------------------------------------------
  // Node ids: 0..nNodes-1; node 0 is the root. For each node we precompute its
  // element mask, parent, sibling, and the cross predicates checked when its
  // two children combine.
  private val plan = branch.plan.toOption.get
  private case class NodeInfo(
      mask: Int,
      parent: Int,            // -1 for root
      sibling: Int,           // -1 for root
      left: Int, right: Int,  // -1 for leaves
      leafElem: Int,          // -1 for internal
      crossPreds: Array[Pred],// preds spanning left/right children
      negSpecs: Array[Int],   // negation specs triggered at this node
  )
  private val nodes: Array[NodeInfo] = {
    val buf = mutable.ArrayBuffer.empty[NodeInfo]
    def build(t: TreePlan, parent: Int): Int = {
      val id = buf.size
      buf += null
      t match {
        case LeafPlan(e) =>
          buf(id) = NodeInfo(1 << e, parent, -1, -1, -1, e, Array.empty, Array.empty)
        case NodePlan(l, r) =>
          val li = build(l, id); val ri = build(r, id)
          val cross = positive.preds.filter { p =>
            val bi = 1 << p.i; val bj = 1 << p.j
            ((l.mask & bi) != 0 && (r.mask & bj) != 0) || ((l.mask & bj) != 0 && (r.mask & bi) != 0)
          }.toArray
          buf(id) = NodeInfo(l.mask | r.mask, parent, -1, li, ri, -1, cross, Array.empty)
      }
      id
    }
    build(plan, -1)
    // fill sibling pointers
    val arr = buf.toArray
    arr.indices.foreach { id =>
      val ni = arr(id)
      if (ni.left >= 0) {
        arr(ni.left) = arr(ni.left).copy(sibling = ni.right)
        arr(ni.right) = arr(ni.right).copy(sibling = ni.left)
      }
    }
    // attach negation specs at the lowest node covering all dependencies
    branch.negs.zipWithIndex.foreach { case (spec, k) =>
      val depMask = spec.dependsOn.foldLeft(0)((m, d) => m | (1 << d))
      // lowest (deepest) node whose mask covers depMask; with depMask == 0 use
      // any leaf's parent — conservatively the root.
      val candidates = arr.indices.filter(id => (arr(id).mask & depMask) == depMask)
      val target =
        if (depMask == 0) 0
        else candidates.minBy(id => java.lang.Integer.bitCount(arr(id).mask))
      arr(target) = arr(target).copy(negSpecs = arr(target).negSpecs :+ k)
    }
    arr
  }
  private val rootId = 0
  private val leafOfElem: Array[Int] = {
    val a = Array.fill(n)(-1)
    nodes.indices.foreach(id => if (nodes(id).leafElem >= 0) a(nodes(id).leafElem) = id)
    a
  }
  private val typeToElem: Map[Int, Int] =
    positive.elems.zipWithIndex.map { case (e, i) => e.typeId -> i }.toMap
  private val negTypeToSpec: Map[Int, Int] =
    branch.negs.zipWithIndex.map { case (s, k) => s.elem.typeId -> k }.toMap

  /** An instance: bound values per element (only positions under the node's mask
    * are set). `bound(e)` is an Event or Array[Event] (Kleene).
    */
  private final class Inst(
      val node: Int,
      val bound: Array[AnyRef],
      val minTs: Double,
      val maxTs: Double,
  ) { var dead: Boolean = false }

  // --- run state ----------------------------------------------------------
  private val instances = Array.fill(nodes.length)(mutable.ArrayBuffer.empty[Inst])
  private val kleeneBuffers = Array.fill(n)(mutable.ArrayDeque.empty[Event])
  private val negBuffers = Array.fill(branch.negs.size)(mutable.ArrayDeque.empty[Event])
  private val consumed = mutable.HashSet.empty[Long]
  private var now = Double.NegativeInfinity
  private var liveCount = 0L
  private var nEvents = 0L
  private var nMatches = 0L
  private var pmCreated = 0L
  private var peakLive = 0L
  private var peakBuffered = 0L
  private var bufferedCount = 0L
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
    evict()
    if ((nEvents & 1023) == 0) sweep()
    negTypeToSpec.get(e.typeId) match {
      case Some(k) =>
        negBuffers(k).append(e); bufferedCount += 1
        if (bufferedCount > peakBuffered) peakBuffered = bufferedCount
      case None =>
        typeToElem.get(e.typeId).foreach { elem =>
          tEventStart = System.nanoTime()
          if (positive.elems(elem).kleene) {
            // Subset semantics at the leaf: every subset of recent same-type
            // events containing `e` forms a leaf instance (§5.2).
            val buf = kleeneBuffers(elem)
            var base = buf.iterator.filter(b => !(consuming && consumed.contains(b.serial))).toArray
            if (base.length > config.maxKleeneBuffer) base = base.takeRight(config.maxKleeneBuffer)
            buf.append(e); bufferedCount += 1
            if (bufferedCount > peakBuffered) peakBuffered = bufferedCount
            val k = base.length
            var m = 0
            while (m < (1 << k)) {
              val members = mutable.ArrayBuffer.empty[Event]
              var i = 0
              while (i < k) { if ((m & (1 << i)) != 0) members += base(i); i += 1 }
              members += e
              makeLeafInst(elem, members.toArray)
              m += 1
            }
          } else makeLeafInst(elem, e)
        }
    }
  }

  private def makeLeafInst(elem: Int, value: AnyRef): Unit = {
    val (vMin, vMax) = value match {
      case ev: Event       => (ev.ts, ev.ts)
      case a: Array[Event] => (a.head.ts, a.last.ts)
    }
    val bound = new Array[AnyRef](n)
    bound(elem) = value
    val inst = new Inst(leafOfElem(elem), bound, vMin, vMax)
    record(inst)
  }

  /** Store the instance (emitting at root) and combine it with its sibling's
    * buffered instances, recursively.
    */
  private def record(inst: Inst): Unit = {
    pmCreated += 1
    if (pmCreated > config.pmCap) throw Abort
    val info = nodes(inst.node)
    if (!negOk(inst, info)) return
    if (inst.node == rootId) { emit(inst); return }
    instances(inst.node) += inst
    liveCount += 1
    if (liveCount > peakLive) peakLive = liveCount
    val sibBuf = instances(info.sibling)
    val sz = sibBuf.size // snapshot: children of this combine land at the parent
    var i = 0
    while (i < sz) {
      val s = sibBuf(i)
      if (!s.dead && s.minTs + W >= now) combine(inst, s, info.parent)
      i += 1
    }
  }

  private def combine(a: Inst, b: Inst, parent: Int): Unit = {
    if (math.max(a.maxTs, b.maxTs) - math.min(a.minTs, b.minTs) > W) return
    if (consuming && (containsConsumed(a) || containsConsumed(b))) return
    val info = nodes(parent)
    val preds = info.crossPreds
    var i = 0
    while (i < preds.length) {
      val p = preds(i)
      val lv = if (a.bound(p.i) != null) a.bound(p.i) else b.bound(p.i)
      val rv = if (a.bound(p.j) != null) a.bound(p.j) else b.bound(p.j)
      if (!evalPair(lv, rv, p.op)) return
      i += 1
    }
    val bound = new Array[AnyRef](n)
    var e = 0
    while (e < n) {
      bound(e) = if (a.bound(e) != null) a.bound(e) else b.bound(e)
      e += 1
    }
    val inst = new Inst(parent, bound, math.min(a.minTs, b.minTs), math.max(a.maxTs, b.maxTs))
    record(inst)
  }

  private def evalPair(lv: AnyRef, rv: AnyRef, op: PredOp): Boolean = (lv, rv) match {
    case (l: Event, r: Event)              => PredEval.eval(op, l, r)
    case (l: Event, r: Array[Event])       => r.forall(x => PredEval.eval(op, l, x))
    case (l: Array[Event], r: Event)       => l.forall(x => PredEval.eval(op, x, r))
    case (l: Array[Event], r: Array[Event]) => l.forall(x => r.forall(y => PredEval.eval(op, x, y)))
  }

  private def containsConsumed(inst: Inst): Boolean = {
    var e = 0
    while (e < n) {
      inst.bound(e) match {
        case null                => ()
        case ev: Event           => if (consumed.contains(ev.serial)) return true
        case a: Array[Event]     => if (a.exists(x => consumed.contains(x.serial))) return true
      }
      e += 1
    }
    false
  }

  private def negOk(inst: Inst, info: NodeInfo): Boolean = {
    var s = 0
    while (s < info.negSpecs.length) {
      val k = info.negSpecs(s)
      val spec = branch.negs(k)
      val it = negBuffers(k).iterator
      while (it.hasNext) {
        val b = it.next()
        if (!(consuming && consumed.contains(b.serial)) && negMatches(spec, inst, b)) return false
      }
      s += 1
    }
    true
  }

  private def negMatches(spec: NegSpec, inst: Inst, b: Event): Boolean = {
    val depOk = spec.dependsOn.forall { d =>
      inst.bound(d) match {
        case null            => false
        case e: Event        => math.abs(e.ts - b.ts) <= W
        case a: Array[Event] => a.forall(e => math.abs(e.ts - b.ts) <= W)
      }
    }
    if (!depOk) return false
    spec.preds.forall { case NegPred(posIdx, op, negOnLeft) =>
      inst.bound(posIdx) match {
        case null => false
        case v =>
          v match {
            case e: Event =>
              if (negOnLeft) PredEval.eval(op, b, e) else PredEval.eval(op, e, b)
            case a: Array[Event] =>
              if (negOnLeft) a.forall(e => PredEval.eval(op, b, e))
              else a.forall(e => PredEval.eval(op, e, b))
          }
      }
    }
  }

  private def emit(inst: Inst): Unit = {
    if (consuming && containsConsumed(inst)) return
    nMatches += 1
    latSum += System.nanoTime() - tEventStart
    if (config.collectMatches) {
      val byElem = Vector.tabulate(n) { e =>
        inst.bound(e) match {
          case ev: Event       => Vector(ev.serial)
          case a: Array[Event] => a.map(_.serial).sorted.toVector
        }
      }
      out += CepMatch(byElem, inst.minTs)
    }
    if (consuming) {
      var e = 0
      while (e < n) {
        inst.bound(e) match {
          case ev: Event       => consumed += ev.serial
          case a: Array[Event] => a.foreach(x => consumed += x.serial)
          case null            => ()
        }
        e += 1
      }
      // kill live instances holding consumed events
      var id = 0
      while (id < instances.length) {
        val buf = instances(id)
        var i = 0
        while (i < buf.size) {
          val x = buf(i)
          if (!x.dead && containsConsumed(x)) { x.dead = true; liveCount -= 1 }
          i += 1
        }
        id += 1
      }
    }
  }

  private def evict(): Unit = {
    val cutoff = now - W
    var e = 0
    while (e < n) {
      val buf = kleeneBuffers(e)
      while (buf.nonEmpty && buf.head.ts < cutoff) { buf.removeHead(); bufferedCount -= 1 }
      e += 1
    }
    var k = 0
    while (k < negBuffers.length) {
      val buf = negBuffers(k)
      while (buf.nonEmpty && buf.head.ts < cutoff) { buf.removeHead(); bufferedCount -= 1 }
      k += 1
    }
  }

  private def sweep(): Unit = {
    val cutoff = now - W
    var id = 0
    while (id < instances.length) {
      val buf = instances(id)
      val before = buf.size
      buf.filterInPlace(x => !x.dead && x.minTs >= cutoff)
      liveCount -= before - buf.size
      id += 1
    }
  }
}
