package repro.core

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Vantage-point tree [Yianilos, SODA'93] built exactly as §5.1 of the paper:
  * a random vantage point, a mean-distance split (objects with
  * `dist <= mu` go left), recursing while a node holds more than `capacity`
  * objects.
  *
  * Three roles in the reproduction:
  *  - the VP-tree DOD baseline and the Exact-Counting verification phase use
  *    [[VPTree.rangeCount]] (range counting with early termination at `k`);
  *  - NNDescent+ initialization uses [[VPTree.leftLeafGroups]] (left leaf
  *    nodes seed exact local K-NNs);
  *  - MRPG takes its *pivots* from vantage points whose left child is a leaf
  *    (Algorithm 3, line 14) — ball-partitioning spreads them across
  *    subspaces, which Connect-SubGraphs and Remove-Detours rely on.
  */
final class VPTree private[core] (
    val root: VPTree.Node,
    val pivots: Array[Int],
    val leftLeafGroups: Array[Array[Int]],
    val nodeCount: Int,
) extends Serializable {

  /** Number of objects within distance `r` of object `q` (excluding `q`),
    * counting stops once it reaches `cap`.
    */
  def rangeCount(space: MetricSpace, q: Int, r: Double, cap: Int): Int = {
    var count = 0
    def visit(node: VPTree.Node): Unit = {
      if (count >= cap) return
      node match {
        case VPTree.Leaf(ids) =>
          var i = 0
          while (i < ids.length && count < cap) {
            val id = ids(i)
            if (id != q && space.dist(q, id) <= r) count += 1
            i += 1
          }
        case VPTree.Internal(vp, mu, maxD, left, right) =>
          val d = space.dist(q, vp)
          // lower bound of any object under this node is d - maxD
          if (d - maxD > r) return
          if (vp != q && d <= r) count += 1
          if (count >= cap) return
          if (d <= mu + r) visit(left)
          if (count < cap && d > mu - r) visit(right)
      }
    }
    visit(root)
    count
  }

  /** Approximate index footprint in bytes (Table 6 accounting). */
  def sizeBytes: Long = {
    var bytes = 0L
    def walk(node: VPTree.Node): Unit = node match {
      case VPTree.Leaf(ids) => bytes += 16L + ids.length * 4L
      case VPTree.Internal(_, _, _, l, r) => bytes += 40L; walk(l); walk(r)
    }
    walk(root)
    bytes
  }
}

object VPTree {
  sealed trait Node extends Serializable
  final case class Internal(vp: Int, mu: Double, maxD: Double, left: Node, right: Node)
      extends Node
  final case class Leaf(ids: Array[Int]) extends Node

  /** Builds a VP-tree over all of `space`. Deterministic in `seed`. */
  def build(space: MetricSpace, capacity: Int, seed: Long): VPTree =
    build(space, Array.range(0, space.n), capacity, seed)

  /** Builds a VP-tree over the given subset of object ids. */
  def build(space: MetricSpace, ids: Array[Int], capacity: Int, seed: Long): VPTree = {
    require(capacity >= 1, "capacity must be >= 1")
    val rng = new Random(seed)
    val pivots = ArrayBuffer.empty[Int]
    val groups = ArrayBuffer.empty[Array[Int]]
    var nodes = 0

    // isLeftChild: whether this subset arrived as a left child (left leaves
    // seed AKNN initialization per Algorithm 3).
    def rec(subset: Array[Int], isLeftChild: Boolean): Node = {
      nodes += 1
      if (subset.length <= capacity) {
        if (isLeftChild && subset.length > 1) groups += subset
        return Leaf(subset)
      }
      val vp = subset(rng.nextInt(subset.length))
      val rest = subset.filter(_ != vp)
      val dists = rest.map(space.dist(vp, _))
      val mu = dists.sum / dists.length
      val maxD = dists.max
      val lb = ArrayBuffer.empty[Int]
      val rb = ArrayBuffer.empty[Int]
      var i = 0
      while (i < rest.length) {
        if (dists(i) <= mu) lb += rest(i) else rb += rest(i)
        i += 1
      }
      if (lb.isEmpty || rb.isEmpty) {
        // degenerate split (all distances equal): stop recursing
        if (isLeftChild && subset.length > 1) groups += subset
        return Leaf(subset)
      }
      if (lb.length <= capacity) pivots += vp
      val left = rec(lb.toArray, isLeftChild = true)
      val right = rec(rb.toArray, isLeftChild = false)
      Internal(vp, mu, maxD, left, right)
    }

    val root = rec(ids, isLeftChild = false)
    new VPTree(root, pivots.distinct.toArray, groups.toArray, nodes)
  }
}
