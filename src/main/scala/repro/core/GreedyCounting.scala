package repro.core

import repro.graph.ProximityGraph

/** Algorithm 2 of the paper: greedy neighbor counting on a proximity graph.
  *
  * BFS from `p`; every first-visited vertex within `r` is counted and
  * expanded; counting stops at `k`. Vertices outside `r` are still expanded
  * when they are pivots (lines 13–14) — Remove-Links relies on pivot
  * pass-through, and pivots also bridge sparse regions. Lemma 1: the
  * returned count never exceeds the true neighbor count, so filtering with
  * it yields no false negatives.
  */
object GreedyCounting {

  /** Returns the greedy count, capped at `k`.
    *
    * @param usePivotHop enable Alg. 2 lines 13–14 (true for MRPG(-basic),
    *                    false for NSW/KGraph as in the paper's §6 setup)
    */
  def count(
      space: MetricSpace,
      g: ProximityGraph,
      p: Int,
      r: Double,
      k: Int,
      usePivotHop: Boolean,
  ): Int = {
    val visited = new java.util.BitSet(space.n)
    val queue = new java.util.ArrayDeque[Integer]()
    visited.set(p)
    queue.add(p)
    var count = 0
    while (!queue.isEmpty) {
      val v = queue.poll().intValue()
      val edges = g.adj(v)
      var i = 0
      while (i < edges.length) {
        val w = edges(i)
        if (!visited.get(w)) {
          visited.set(w)
          if (space.dist(p, w) <= r) {
            count += 1
            if (count >= k) return count
            queue.add(w)
          } else if (usePivotHop && g.isPivot(w)) {
            queue.add(w)
          }
        }
        i += 1
      }
    }
    count
  }

  /** §5.5 direct decision for an object carrying an exact K'-NN list: counts
    * how many of the listed nearest neighbors are within `r` (capped at `k`).
    * Exact in both directions when `k <= K'`: if fewer than `k` of the true
    * `K'` nearest are within `r`, the k-th NN is beyond `r`.
    */
  def countExactList(space: MetricSpace, list: Array[Int], p: Int, r: Double, k: Int): Int = {
    var count = 0
    var i = 0
    while (i < list.length && count < k) {
      if (space.dist(p, list(i)) <= r) count += 1
      else return count // list is sorted by distance: nothing closer follows
      i += 1
    }
    count
  }
}
