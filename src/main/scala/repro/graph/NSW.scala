package repro.graph

import repro.core.MetricSpace
import scala.collection.mutable
import scala.util.Random

/** Navigable Small World graph [Malkov et al., Inf. Systems'14].
  *
  * Incremental construction: objects are inserted in random order; each new
  * object runs `attempts` greedy searches from random entry points, collects
  * every evaluated vertex, and links bidirectionally to the `f` closest.
  * The construction is inherently sequential (each insertion must see the
  * links of its predecessors) — the paper stresses NSW cannot use
  * multi-threading, and Table 3's build times depend on that, so this
  * implementation deliberately runs on the driver only.
  *
  * The paper sets NSW's link count so its memory matches KGraph; with
  * `f = K/2` bidirectional links the average degree is ~K.
  */
object NSW {

  /** @param attempts multi-start greedy searches per insertion; 0 (default)
    *                  means `f`, matching the original construction where the
    *                  number of searches tracks the link count
    */
  def build(space: MetricSpace, f: Int, attempts: Int = 0, seed: Long = 7L): ProximityGraph = {
    val n = space.n
    val w = if (attempts > 0) attempts else f
    val rng = new Random(seed)
    val adj = Array.fill(n)(mutable.ArrayBuffer.empty[Int])
    val order = rng.shuffle((0 until n).toList).toArray

    var t = 0
    while (t < order.length) {
      val q = order(t)
      if (t > 0) {
        val friends = searchFriends(space, adj, order, t, q, f, w, rng)
        friends.foreach { u =>
          if (!adj(q).contains(u)) adj(q) += u
          if (!adj(u).contains(q)) adj(u) += q
        }
      }
      t += 1
    }
    ProximityGraph.plain(adj.map(_.toArray))
  }

  /** Multi-start greedy descent toward `q`; returns the `f` closest evaluated
    * vertices across all attempts.
    */
  private def searchFriends(
      space: MetricSpace,
      adj: Array[mutable.ArrayBuffer[Int]],
      order: Array[Int],
      inserted: Int,
      q: Int,
      f: Int,
      attempts: Int,
      rng: Random,
  ): Seq[Int] = {
    val evaluated = mutable.HashMap.empty[Int, Double]
    def d(u: Int): Double = evaluated.getOrElseUpdate(u, space.dist(q, u))

    var a = 0
    while (a < attempts) {
      var cur = order(rng.nextInt(inserted))
      var curD = d(cur)
      var improved = true
      while (improved) {
        improved = false
        val edges = adj(cur)
        var i = 0
        var best = cur
        var bestD = curD
        while (i < edges.length) {
          val w = edges(i)
          val dw = d(w)
          if (dw < bestD) { best = w; bestD = dw }
          i += 1
        }
        if (best != cur) { cur = best; curD = bestD; improved = true }
      }
      a += 1
    }
    evaluated.toSeq.sortBy { case (id, dd) => (dd, id) }.take(f).map(_._1)
  }

  /** Greedy ANN search used by Connect-SubGraphs (§5.2): walk from `start`
    * toward `query`, hop-limited, returning the closest vertex reached.
    */
  def greedyAnnSearch(
      space: MetricSpace,
      adj: Array[Array[Int]],
      start: Int,
      query: Int,
      maxHops: Int,
  ): Int = {
    var cur = start
    var curD = space.dist(query, cur)
    var hops = 0
    var improved = true
    while (improved && hops < maxHops) {
      improved = false
      val edges = adj(cur)
      var i = 0
      var best = cur
      var bestD = curD
      while (i < edges.length) {
        val w = edges(i)
        if (w != query) {
          val dw = space.dist(query, w)
          if (dw < bestD) { best = w; bestD = dw }
        }
        i += 1
      }
      if (best != cur) { cur = best; curD = bestD; improved = true; hops += 1 }
    }
    cur
  }
}
