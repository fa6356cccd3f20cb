package repro.graph

import repro.core.{MetricSpace, ParRunner}
import scala.collection.mutable
import scala.util.Random

/** §5.3 / Algorithm 5: create (approximate) monotonic paths.
  *
  * For a pivot-weighted sample of ~n/K target objects `p`: a 3-hop BFS from
  * `p` and 2-hop BFSes from up to `min(K,10)` sampled nearby pivots find
  * objects `w` whose discovered paths are detours (no predecessor `u` on a
  * monotonic prefix with `dist(p,u) <= dist(p,w)`). Those objects are sorted
  * ascending by distance to `p` and chain-linked `p -> A[0] -> A[1] -> ...`,
  * which makes the path from `p` through them monotonic (Definition 3).
  *
  * The per-target BFS is read-only, so targets are fanned out through the
  * [[ParRunner]] (generation-stamped scratch arrays keep each BFS
  * allocation-free); link additions are applied on the driver.
  */
object RemoveDetours {

  val MaxVisitsPerBfs = 4096 // safety bound, |A| is O(K^2) per the paper

  /** Per-chunk BFS scratch: generation stamps avoid clearing O(n) arrays
    * between the O(n/K) BFS runs of a chunk.
    */
  private final class Scratch(n: Int) {
    val dp = new Array[Double](n)
    val hop = new Array[Int](n)
    val mono = new Array[Boolean](n)
    private val gen = new Array[Int](n)
    private var cur = 0
    val queue = new java.util.ArrayDeque[Integer]()

    def begin(): Unit = { cur += 1; queue.clear() }
    def seen(v: Int): Boolean = gen(v) == cur
    def mark(v: Int): Unit = gen(v) = cur
  }

  /** Mutates `adj`; returns the number of links added. */
  def run(
      space: MetricSpace,
      adj: Array[mutable.LinkedHashSet[Int]],
      isPivot: Array[Boolean],
      isExact: Array[Boolean],
      k0: Int,
      runner: ParRunner,
      seed: Long,
  ): Long = {
    val n = adj.length
    val k = math.max(2, k0)
    val rng = new Random(seed)

    // ---- pivot-weighted sample of |P'| = O(n/K) targets ----------------
    val nTargets = math.max(1, n / k)
    val pivotPool = rng.shuffle((0 until n).filter(v => isPivot(v) && !isExact(v)).toList)
    val restPool = rng.shuffle((0 until n).filter(v => !isExact(v)).toList)
    val targets =
      (pivotPool.take(nTargets / 2) ++ restPool).distinct.take(nTargets).toArray

    val adjArr = adj.map(_.toArray)
    val maxA = k * k
    val pivotSample = math.min(k, 10)

    val chains: Seq[Array[Array[Int]]] =
      runner.runWithData(
        targets.length,
        (space, adjArr, isPivot, isExact, targets, maxA, pivotSample),
      ) { (data, s, e) =>
        val (sp, g, piv, exact, tg, cap, nPiv) = data
        val scratch = new Scratch(g.length)
        (s until e).map(i => chainFor(sp, g, piv, exact, tg(i), cap, nPiv, scratch)).toArray
      }

    // ---- chain-link on the driver --------------------------------------
    var added = 0L
    def link(a: Int, b: Int): Unit = {
      if (a != b) {
        if (!isExact(a) && !adj(a).contains(b)) { adj(a) += b; added += 1 }
        if (!isExact(b) && !adj(b).contains(a)) { adj(b) += a; added += 1 }
      }
    }
    chains.flatten.foreach { chain =>
      var i = 0
      while (i + 1 < chain.length) { link(chain(i), chain(i + 1)); i += 1 }
    }
    added
  }

  /** The chain `p :: A` for one target (`A` ascending by distance to `p`). */
  private def chainFor(
      space: MetricSpace,
      adj: Array[Array[Int]],
      isPivot: Array[Boolean],
      isExact: Array[Boolean],
      p: Int,
      maxA: Int,
      pivotSample: Int,
      scratch: Scratch,
  ): Array[Int] = {
    val acc = mutable.HashMap.empty[Int, Double] // non-monotonic id -> dist to p

    val pivotCands = getNonMonotonic(space, adj, p, p, 3, acc, scratch)

    // pivots "with small distances to p": found at hop >= 2 of the BFS,
    // excluding exact-list objects (Alg. 5 line 5 conditions)
    val pivs = pivotCands
      .filter { case (id, _) => isPivot(id) && !isExact(id) }
      .sortBy(_._2)
      .take(pivotSample)
    pivs.foreach { case (pv, _) => getNonMonotonic(space, adj, p, pv, 2, acc, scratch) }

    val direct = adj(p).toSet
    val a = acc.iterator
      .filter { case (id, _) => id != p && !direct.contains(id) }
      .toArray
      .sortBy { case (id, d) => (d, id) }
      .take(maxA)
      .map(_._1)
    p +: a
  }

  /** Hop-limited BFS from `start`, distances measured from `p`. Adds objects
    * with no monotonic discovered path to `acc`; returns the visited pivots
    * at hop >= 2 with their distances (used for Alg. 5's pivot sampling).
    */
  private def getNonMonotonic(
      space: MetricSpace,
      adj: Array[Array[Int]],
      p: Int,
      start: Int,
      maxHops: Int,
      acc: mutable.HashMap[Int, Double],
      sc: Scratch,
  ): Array[(Int, Double)] = {
    sc.begin()
    val pivotCands = mutable.ArrayBuffer.empty[(Int, Double)]
    val visitedIds = mutable.ArrayBuffer.empty[Int]

    sc.mark(start)
    sc.dp(start) = if (start == p) 0.0 else space.dist(p, start)
    sc.mono(start) = true
    sc.hop(start) = 0
    sc.queue.add(start)
    visitedIds += start
    var visits = 0

    while (!sc.queue.isEmpty && visits < MaxVisitsPerBfs) {
      val u = sc.queue.poll().intValue()
      visits += 1
      val hu = sc.hop(u)
      if (hu < maxHops) {
        val du = sc.dp(u)
        val mu = sc.mono(u)
        val edges = adj(u)
        var i = 0
        while (i < edges.length) {
          val w = edges(i)
          if (!sc.seen(w)) {
            sc.mark(w)
            val dw = if (w == p) 0.0 else space.dist(p, w)
            sc.dp(w) = dw
            sc.mono(w) = mu && du <= dw
            sc.hop(w) = hu + 1
            if (hu + 1 >= 2) pivotCands += ((w, dw))
            sc.queue.add(w)
            visitedIds += w
          } else if (!sc.mono(w) && mu && du <= sc.dp(w)) {
            sc.mono(w) = true // a second, monotonic path reached w
          }
          i += 1
        }
      }
    }

    visitedIds.foreach { w =>
      if (!sc.mono(w) && w != p) {
        val d = sc.dp(w)
        acc.get(w) match {
          case Some(old) if old <= d => ()
          case _ => acc(w) = d
        }
      }
    }
    pivotCands.toArray
  }
}
