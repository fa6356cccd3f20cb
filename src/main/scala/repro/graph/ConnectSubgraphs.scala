package repro.graph

import repro.core.MetricSpace
import scala.collection.mutable
import scala.util.Random

/** §5.2 / Algorithm 4: make the AKNN graph (strongly) connected.
  *
  * Phase 1 adds reverse-AKNN links (the directed AKNN graph becomes
  * undirected), except into vertices carrying exact K'-NN lists — their link
  * sets stay exactly their K' nearest so the §5.5 direct decision stays
  * meaningful (they remain reachable through the reverse links added *from*
  * them). Phase 2 repeatedly BFSes; while some objects are unreached, it
  * greedily ANN-searches from a few reached pivots toward an unreached pivot
  * (hop-limited to 10 as in the paper) and links the closest pair found.
  */
object ConnectSubgraphs {

  val AnnMaxHops = 10
  val StartPivots = 5 // |V_piv|, "a small constant"

  /** Mutates `adj`; returns the number of links added. */
  def run(
      space: MetricSpace,
      adj: Array[mutable.LinkedHashSet[Int]],
      isPivot: Array[Boolean],
      isExact: Array[Boolean],
      seed: Long,
  ): Long = {
    val n = adj.length
    val rng = new Random(seed)
    var added = 0L

    // ---- reverse AKNN phase --------------------------------------------
    val snapshot = adj.map(_.toArray)
    var v = 0
    while (v < n) {
      val out = snapshot(v)
      var i = 0
      while (i < out.length) {
        val u = out(i)
        if (!isExact(u) && !adj(u).contains(v)) { adj(u) += v; added += 1 }
        i += 1
      }
      v += 1
    }

    // ---- BFS with ANN phase --------------------------------------------
    val visited = new java.util.BitSet(n)
    val queue = new java.util.ArrayDeque[Integer]()
    var reached = 0

    def bfsFrom(s: Int): Unit = {
      if (visited.get(s)) return
      visited.set(s); reached += 1
      queue.add(s)
      while (!queue.isEmpty) {
        val x = queue.poll().intValue()
        adj(x).foreach { w =>
          if (!visited.get(w)) { visited.set(w); reached += 1; queue.add(w) }
        }
      }
    }

    val visitedList = mutable.ArrayBuffer.empty[Int] // reached ids, for sampling
    def refreshVisitedList(): Unit = {
      visitedList.clear()
      var i = visited.nextSetBit(0)
      while (i >= 0) { visitedList += i; i = visited.nextSetBit(i + 1) }
    }

    bfsFrom(rng.nextInt(n))
    var guard = 0
    while (reached < n && guard < n) {
      guard += 1
      // a random unreached object, preferring pivots (v'_piv)
      val unreached = (0 until n).filter(!visited.get(_))
      val unreachedPivots = unreached.filter(isPivot(_))
      val target =
        if (unreachedPivots.nonEmpty) unreachedPivots(rng.nextInt(unreachedPivots.length))
        else unreached(rng.nextInt(unreached.length))

      refreshVisitedList()
      val reachedPivots = visitedList.filter(isPivot(_))
      val starts =
        (if (reachedPivots.nonEmpty)
           Seq.fill(StartPivots)(reachedPivots(rng.nextInt(reachedPivots.length)))
         else Seq.fill(StartPivots)(visitedList(rng.nextInt(visitedList.length)))).distinct

      val adjArr = adj.map(_.toArray) // snapshot for the ANN walks
      var best = -1
      var bestD = Double.MaxValue
      starts.foreach { s =>
        val ann = NSW.greedyAnnSearch(space, adjArr, s, target, AnnMaxHops)
        val d = space.dist(ann, target)
        if (d < bestD) { bestD = d; best = ann }
      }
      if (best >= 0 && best != target) {
        if (!adj(target).contains(best)) { adj(target) += best; added += 1 }
        if (!adj(best).contains(target)) { adj(best) += target; added += 1 }
      }
      bfsFrom(target)
    }
    added
  }
}
