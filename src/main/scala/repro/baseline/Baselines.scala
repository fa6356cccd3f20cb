package repro.baseline

import org.apache.spark.sql.{Encoders, SparkSession}
import repro.core.{BruteForce, MetricSpace, VPTree}
import scala.collection.mutable
import scala.util.Random

/** Result of a baseline DOD run. */
final case class BaselineResult(outliers: Array[Int], totalMs: Long, indexBytes: Long)

/** Nested-loop DOD [Knorr & Ng, VLDB'98]: for each object scan P, stopping
  * when the neighbor count reaches `k`. Parallelized across Spark partitions
  * (the paper runs all algorithms multi-threaded).
  */
object NestedLoop {
  def run(spark: SparkSession, space: MetricSpace, r: Double, k: Int, partitions: Int = 0): BaselineResult = {
    val t0 = System.nanoTime()
    val parts = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    val bSpace = spark.sparkContext.broadcast(space)
    val out = spark
      .range(space.n)
      .repartition(parts)
      .mapPartitions { it =>
        val sp = bSpace.value
        it.flatMap { id =>
          val p = id.toInt
          if (BruteForce.countNeighbors(sp, p, r, k) < k) Iterator.single(p) else Iterator.empty
        }
      }(Encoders.scalaInt)
      .collect()
      .sorted
    bSpace.destroy()
    BaselineResult(out, (System.nanoTime() - t0) / 1000000L, 0L)
  }
}

/** SNIF [Tao et al., KDD'06], in-memory form: one scan assigns each object
  * to the first cluster center within `r/2` (new centers are opened as
  * needed — centers are "randomly chosen" by randomizing the scan order).
  * Objects in the same cluster are mutual neighbors by the triangle
  * inequality, so clusters with more than `k` members are all inliers; the
  * rest count neighbors only against clusters whose center lies within
  * `3r/2` (no neighbor can live farther). The counting pass is parallelized
  * across partitions.
  */
object SNIF {
  def run(
      spark: SparkSession,
      space: MetricSpace,
      r: Double,
      k: Int,
      seed: Long = 11L,
      partitions: Int = 0,
  ): BaselineResult = {
    val t0 = System.nanoTime()
    val n = space.n
    val rng = new Random(seed)
    val order = rng.shuffle((0 until n).toList)

    // sequential cluster formation (order-dependent, as in the paper)
    val centers = mutable.ArrayBuffer.empty[Int]
    val members = mutable.ArrayBuffer.empty[mutable.ArrayBuffer[Int]]
    val clusterOf = new Array[Int](n)
    order.foreach { p =>
      var c = 0
      var assigned = -1
      while (assigned < 0 && c < centers.length) {
        if (space.dist(p, centers(c)) <= r / 2) assigned = c
        c += 1
      }
      if (assigned < 0) {
        centers += p; members += mutable.ArrayBuffer.empty[Int]
        assigned = centers.length - 1
      }
      members(assigned) += p
      clusterOf(p) = assigned
    }
    val centerArr = centers.toArray
    val memberArr = members.map(_.toArray).toArray
    val indexBytes = centerArr.length * 12L + n * 4L

    // parallel counting for objects in small clusters
    val pending = (0 until n).filter(p => memberArr(clusterOf(p)).length <= k).toArray
    val parts = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    val bData = spark.sparkContext.broadcast((space, centerArr, memberArr, clusterOf))
    val out: Array[Int] =
      if (pending.isEmpty) Array.empty[Int]
      else
        spark
          .createDataset(pending.toSeq)(Encoders.scalaInt)
          .repartition(parts)
          .mapPartitions { it =>
            val (sp, cts, mem, cOf) = bData.value
            it.flatMap { p =>
              var count = mem(cOf(p)).length - 1 // co-members are neighbors
              var c = 0
              while (count < k && c < cts.length) {
                if (c != cOf(p) && sp.dist(p, cts(c)) <= 1.5 * r) {
                  val ms = mem(c)
                  var i = 0
                  while (count < k && i < ms.length) {
                    if (sp.dist(p, ms(i)) <= r) count += 1
                    i += 1
                  }
                }
                c += 1
              }
              if (count < k) Iterator.single(p) else Iterator.empty
            }
          }(Encoders.scalaInt)
          .collect()
    bData.destroy()
    BaselineResult(out.sorted, (System.nanoTime() - t0) / 1000000L, indexBytes)
  }
}

/** DOLPHIN [Angiulli & Fassetti, TKDD'09], in-memory form: a first scan
  * compares each object against an index of previously seen objects,
  * updating partial neighbor counts on both sides and stopping early once
  * an object is proven an inlier (proven inliers are indexed only with a
  * small probability, as in DOLPHIN's `p_inlier`); the surviving indexed
  * objects are candidates, verified in a parallel second scan.
  */
object Dolphin {
  def run(
      spark: SparkSession,
      space: MetricSpace,
      r: Double,
      k: Int,
      pInlier: Double = 0.05,
      seed: Long = 13L,
      partitions: Int = 0,
  ): BaselineResult = {
    val t0 = System.nanoTime()
    val n = space.n
    val rng = new Random(seed)

    val indexIds = mutable.ArrayBuffer.empty[Int]
    val counts = mutable.HashMap.empty[Int, Int]
    var p = 0
    while (p < n) {
      var cnt = 0
      var i = 0
      while (cnt < k && i < indexIds.length) {
        val q = indexIds(i)
        if (space.dist(p, q) <= r) {
          cnt += 1
          val cq = counts(q) + 1
          counts(q) = cq
        }
        i += 1
      }
      if (cnt >= k) {
        // proven inlier; keep in the index only with probability pInlier
        if (rng.nextDouble() < pInlier) { indexIds += p; counts(p) = cnt }
      } else { indexIds += p; counts(p) = cnt }
      p += 1
    }
    val indexBytes = indexIds.length * 8L

    val candidates = indexIds.filter(q => counts(q) < k).toArray
    val parts = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    val bSpace = spark.sparkContext.broadcast(space)
    val out: Array[Int] =
      if (candidates.isEmpty) Array.empty[Int]
      else
        spark
          .createDataset(candidates.toSeq)(Encoders.scalaInt)
          .repartition(parts)
          .mapPartitions { it =>
            val sp = bSpace.value
            it.flatMap { q =>
              if (BruteForce.countNeighbors(sp, q, r, k) < k) Iterator.single(q)
              else Iterator.empty
            }
          }(Encoders.scalaInt)
          .collect()
    bSpace.destroy()
    BaselineResult(out.sorted, (System.nanoTime() - t0) / 1000000L, indexBytes)
  }
}

/** VP-tree DOD [Yianilos, SODA'93 + Chen et al., PVLDB'17]: build the tree
  * offline, then range-count every object with early termination at `k`.
  */
object VPTreeDOD {
  def run(
      spark: SparkSession,
      space: MetricSpace,
      r: Double,
      k: Int,
      tree: VPTree,
      partitions: Int = 0,
  ): BaselineResult = {
    val t0 = System.nanoTime()
    val parts = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    val bData = spark.sparkContext.broadcast((space, tree))
    val out = spark
      .range(space.n)
      .repartition(parts)
      .mapPartitions { it =>
        val (sp, tr) = bData.value
        it.flatMap { id =>
          val p = id.toInt
          if (tr.rangeCount(sp, p, r, k) < k) Iterator.single(p) else Iterator.empty
        }
      }(Encoders.scalaInt)
      .collect()
      .sorted
    bData.destroy()
    BaselineResult(out, (System.nanoTime() - t0) / 1000000L, tree.sizeBytes)
  }
}
