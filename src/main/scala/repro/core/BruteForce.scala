package repro.core

/** Ground-truth helpers: O(n^2) neighbor counting with the same early
  * termination every evaluated algorithm uses. This doubles as the
  * sequential Nested-loop baseline core [Knorr & Ng, VLDB'98].
  */
object BruteForce {

  /** Number of neighbors of `p` within `r`, counting stops at `cap`. */
  def countNeighbors(space: MetricSpace, p: Int, r: Double, cap: Int): Int = {
    var count = 0
    var i = 0
    val n = space.n
    while (i < n && count < cap) {
      if (i != p && space.dist(p, i) <= r) count += 1
      i += 1
    }
    count
  }

  /** Exact neighbor count of `p` (no cap). */
  def exactCount(space: MetricSpace, p: Int, r: Double): Int =
    countNeighbors(space, p, r, Int.MaxValue)

  /** All distance-based outliers (objects with fewer than `k` neighbors). */
  def outliers(space: MetricSpace, r: Double, k: Int): Array[Int] = {
    val out = Array.newBuilder[Int]
    var p = 0
    while (p < space.n) {
      if (countNeighbors(space, p, r, k) < k) out += p
      p += 1
    }
    out.result()
  }

  /** Exact K nearest neighbors of `p` (excluding itself), ascending by
    * distance; ties broken by id for determinism.
    */
  def knn(space: MetricSpace, p: Int, k: Int): Array[Int] = {
    val n = space.n
    val ids = new Array[Int](n - 1)
    val ds = new Array[Double](n - 1)
    var i = 0; var j = 0
    while (i < n) {
      if (i != p) { ids(j) = i; ds(j) = space.dist(p, i); j += 1 }
      i += 1
    }
    val order = ids.indices.sortBy(t => (ds(t), ids(t)))
    order.take(k).map(ids(_)).toArray
  }
}
