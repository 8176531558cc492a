package repro.core

/** An order-based evaluation plan (§3.1): a permutation of pattern element
  * positions. `order(0)` is processed first (the lazy-NFA "initial" type).
  */
final case class OrderPlan(order: Vector[Int]) extends Serializable {
  require(order.sorted == order.indices.toVector, s"not a permutation: $order")
  def n: Int = order.size
  /** planPos(elem) = position of pattern element `elem` in the plan. */
  lazy val planPos: Vector[Int] = {
    val a = Array.fill(n)(-1)
    order.zipWithIndex.foreach { case (e, p) => a(e) = p }
    a.toVector
  }
}

/** A tree-based evaluation plan (§3.1): a binary tree whose leaves are pattern
  * element positions. Mirrors bushy join trees (Fig 2b ≈ Fig 1c).
  */
sealed trait TreePlan extends Serializable {
  /** Leaves in left-to-right order. */
  def leaves: Vector[Int] = this match {
    case LeafPlan(e)    => Vector(e)
    case NodePlan(l, r) => l.leaves ++ r.leaves
  }
  /** Bitmask of element positions covered by this subtree. */
  def mask: Int = this match {
    case LeafPlan(e)    => 1 << e
    case NodePlan(l, r) => l.mask | r.mask
  }
  /** All nodes (pre-order). */
  def nodes: Vector[TreePlan] = this match {
    case l: LeafPlan    => Vector(l)
    case n @ NodePlan(l, r) => n +: (l.nodes ++ r.nodes)
  }
}
final case class LeafPlan(elem: Int) extends TreePlan
final case class NodePlan(l: TreePlan, r: TreePlan) extends TreePlan {
  require((l.mask & r.mask) == 0, "subtrees must cover disjoint elements")
}

object TreePlan {
  /** The left-deep tree equivalent of an order plan (§3.2: one left-deep tree per order). */
  def leftDeep(o: OrderPlan): TreePlan =
    o.order.tail.foldLeft(LeafPlan(o.order.head): TreePlan)((acc, e) => NodePlan(acc, LeafPlan(e)))

  /** All bushy trees over the given leaf set (tests / tiny n only). */
  def enumerate(elems: Vector[Int]): Vector[TreePlan] =
    if (elems.size == 1) Vector(LeafPlan(elems.head))
    else {
      // Split into every (non-empty, non-full) subset containing elems.head to
      // avoid generating each unordered {L,R} split twice with mirrored children;
      // both child orders are still produced for the *other* levels via recursion,
      // but cost models are symmetric in (l, r) so this is exhaustive for costs.
      val head = elems.head
      val rest = elems.tail
      (0 until (1 << rest.size)).toVector.flatMap { m =>
        val left  = head +: rest.zipWithIndex.collect { case (e, i) if (m & (1 << i)) != 0 => e }
        val right = rest.zipWithIndex.collect { case (e, i) if (m & (1 << i)) == 0 => e }
        if (right.isEmpty) Vector.empty
        else for (l <- enumerate(left); r <- enumerate(right)) yield NodePlan(l, r): TreePlan
      }
    }

  /** All trees with a fixed left-to-right leaf order (the ZStream search space, §2.3). */
  def enumerateFixedOrder(leaves: Vector[Int]): Vector[TreePlan] =
    if (leaves.size == 1) Vector(LeafPlan(leaves.head))
    else
      (1 until leaves.size).toVector.flatMap { cut =>
        for {
          l <- enumerateFixedOrder(leaves.take(cut))
          r <- enumerateFixedOrder(leaves.drop(cut))
        } yield NodePlan(l, r): TreePlan
      }
}
