package repro.data

import repro.core._
import scala.util.Random

/** The five pattern categories of the evaluation (§7.2). */
sealed abstract class Category(val name: String) { override def toString: String = name }
case object SequenceCat    extends Category("sequence")
case object NegationCat    extends Category("negation")
case object ConjunctionCat extends Category("conjunction")
case object KleeneCat      extends Category("Kleene closure")
case object DisjunctionCat extends Category("disjunction")

object Category {
  val all: Vector[Category] =
    Vector(SequenceCat, NegationCat, ConjunctionCat, KleeneCat, DisjunctionCat)
}

/** Random pattern generator reproducing the §7.2 workload: patterns of
  * `size` ∈ [3,7] distinct stock types, with ⌊size/2⌋ predicates comparing the
  * `difference` attributes of two of the involved types, shifted to hit target
  * selectivities log-uniform in the paper's measured range.
  */
object PatternGen {

  /** Random predicates over element positions `0 until size`, with pairwise
    * distinct endpoints pairs.
    */
  private def randomPreds(
      size: Int,
      elems: Vector[Elem],
      provider: MeasuredStatsProvider,
      rnd: Random,
      nPreds: Int,
  ): Vector[Pred] = {
    val pairs = rnd.shuffle((for (i <- 0 until size; j <- i + 1 until size) yield (i, j)).toVector)
    pairs.take(nPreds).map { case (i, j) =>
      // Target selectivity log-uniform in [0.01, 0.8] (§7.2 measured 0.002–0.88).
      val target = math.exp(math.log(0.01) + rnd.nextDouble() * (math.log(0.8) - math.log(0.01)))
      val shift =
        provider.shiftForTargetSelectivity(elems(i).typeId, elems(j).typeId, target, rnd.nextLong())
      Pred(i, j, AttrCmp(0, shift, less = true))
    }
  }

  private def pickElems(size: Int, nTypes: Int, rnd: Random): Vector[Elem] =
    rnd.shuffle((0 until nTypes).toVector).take(size).map(t => Elem(t, s"T$t"))

  /** Generate one pattern of the given category and size. Deterministic in
    * (category, size, seed).
    */
  def generate(
      category: Category,
      size: Int,
      nTypes: Int,
      provider: MeasuredStatsProvider,
      seed: Long,
  ): Pattern = {
    val rnd = new Random(seed ^ (category.name.hashCode.toLong << 20) ^ (size.toLong << 40))
    val w = provider.window
    val nPreds = math.max(1, size / 2)
    category match {
      case SequenceCat =>
        val elems = pickElems(size, nTypes, rnd)
        Pattern.simple(SimplePattern(SEQ, elems, randomPreds(size, elems, provider, rnd, nPreds), w))
      case ConjunctionCat =>
        val elems = pickElems(size, nTypes, rnd)
        Pattern.simple(SimplePattern(AND, elems, randomPreds(size, elems, provider, rnd, nPreds), w))
      case NegationCat =>
        // A sequence with one negated event in the interior (never first/last:
        // the §5.3 construction tests the negation between its SEQ neighbours).
        val elems0 = pickElems(size, nTypes, rnd)
        val negPos = 1 + rnd.nextInt(size - 2)
        val elems = elems0.zipWithIndex.map { case (e, i) => if (i == negPos) e.copy(negated = true) else e }
        Pattern.simple(SimplePattern(SEQ, elems, randomPreds(size, elems, provider, rnd, nPreds), w))
      case KleeneCat =>
        // A sequence with one event under KL. The lowest-rate type carries the
        // closure so the (intrinsically exponential) subset expansion stays
        // laptop-feasible; the paper's cost model postpones it to the last plan
        // step in either case (§5.2).
        val elems0 = pickElems(size, nTypes, rnd)
        val klPos = elems0.zipWithIndex.minBy { case (e, _) => provider.rate(e) }._2
        val elems = elems0.zipWithIndex.map { case (e, i) => if (i == klPos) e.copy(kleene = true) else e }
        Pattern.simple(SimplePattern(SEQ, elems, randomPreds(size, elems, provider, rnd, nPreds), w))
      case DisjunctionCat =>
        // A disjunction of three sequences of the given size (§7.2).
        val branches = Vector.tabulate(3) { b =>
          val elems = pickElems(size, nTypes, new Random(rnd.nextLong()))
          (elems, randomPreds(size, elems, provider, new Random(rnd.nextLong()), nPreds))
        }
        val root = OpNode(OR, branches.map { case (elems, _) => OpNode(SEQ, elems.map(LeafNode(_))) })
        val preds = branches.zipWithIndex.flatMap { case ((_, ps), b) =>
          ps.map(_.remap(_ + b * size)) // leaf indices are global, branch-offset
        }
        Pattern(root, preds, w)
    }
  }
}
