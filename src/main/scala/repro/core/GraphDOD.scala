package repro.core

import org.apache.spark.sql.{DataFrame, Encoders, SparkSession}
import repro.graph.ProximityGraph

/** Exact neighbor counting for the verification phase (`Exact-Counting` in
  * Algorithm 1): a linear scan for high-dimensional data, a VP-tree range
  * count for data with low intrinsic dimensionality. Both stop at `k`.
  */
sealed trait ExactCounter extends Serializable {
  def count(space: MetricSpace, p: Int, r: Double, k: Int): Int
  def name: String
  def sizeBytes: Long
}

final case class LinearScanCounter() extends ExactCounter {
  def count(space: MetricSpace, p: Int, r: Double, k: Int): Int =
    BruteForce.countNeighbors(space, p, r, k)
  def name = "linear-scan"
  def sizeBytes = 0L
}

final case class VPTreeCounter(tree: VPTree) extends ExactCounter {
  def count(space: MetricSpace, p: Int, r: Double, k: Int): Int =
    tree.rangeCount(space, p, r, k)
  def name = "vp-tree"
  def sizeBytes: Long = tree.sizeBytes
}

/** Result of one DOD run.
  *
  * @param outliers       detected outlier ids (sorted)
  * @param candidates     |P'| — objects that survived filtering (excludes
  *                       exact-list direct decisions)
  * @param falsePositives inliers among the candidates (Table 7's `f`)
  * @param directOutliers outliers decided by the exact-list shortcut (§5.5)
  * @param filterMs       filtering phase wall-clock [ms]
  * @param verifyMs       verification phase wall-clock [ms]
  */
final case class DODResult(
    outliers: Array[Int],
    candidates: Int,
    falsePositives: Int,
    directOutliers: Int,
    filterMs: Long,
    verifyMs: Long,
) {
  def totalMs: Long = filterMs + verifyMs
}

/** Algorithm 1: proximity-graph-based DOD — filtering by Greedy-Counting,
  * then exact verification of the candidates. Exact for any proximity graph
  * (Lemma 1: filtering has no false negatives).
  */
object GraphDOD {

  // per-object filtering verdicts
  private val Inlier = 0: Byte // filtered: proven inlier
  private val Candidate = 1: Byte // needs verification
  private val DirectOutlier = 2: Byte // exact-list shortcut says outlier
  private val DirectInlier = 3: Byte // exact-list shortcut says inlier

  /** One object's filtering verdict (§4 filtering phase + §5.5 shortcut). */
  def filterVerdict(
      space: MetricSpace,
      g: ProximityGraph,
      p: Int,
      r: Double,
      k: Int,
      usePivotHop: Boolean,
      useExactShortcut: Boolean,
  ): Byte = {
    if (useExactShortcut && g.hasExactList(p) && k <= g.exactK) {
      val c = GreedyCounting.countExactList(space, g.exactLists(p), p, r, k)
      if (c < k) DirectOutlier else DirectInlier
    } else {
      val c = GreedyCounting.count(space, g, p, r, k, usePivotHop)
      if (c < k) Candidate else Inlier
    }
  }

  /** Driver-local run (no Spark) — used by property tests and as the
    * reference the Spark run must match.
    */
  def detectLocal(
      space: MetricSpace,
      g: ProximityGraph,
      r: Double,
      k: Int,
      usePivotHop: Boolean = true,
      useExactShortcut: Boolean = true,
      counter: ExactCounter = LinearScanCounter(),
  ): DODResult = {
    val n = space.n
    val t0 = System.nanoTime()
    val verdicts = new Array[Byte](n)
    var p = 0
    while (p < n) {
      verdicts(p) = filterVerdict(space, g, p, r, k, usePivotHop, useExactShortcut)
      p += 1
    }
    val t1 = System.nanoTime()
    val out = Array.newBuilder[Int]
    var candidates = 0
    var direct = 0
    var fp = 0
    p = 0
    while (p < n) {
      verdicts(p) match {
        case Candidate =>
          candidates += 1
          if (counter.count(space, p, r, k) < k) out += p else fp += 1
        case DirectOutlier => direct += 1; out += p
        case _ => ()
      }
      p += 1
    }
    val t2 = System.nanoTime()
    DODResult(out.result().sorted, candidates, fp, direct,
      (t1 - t0) / 1000000L, (t2 - t1) / 1000000L)
  }

  /** Spark run: the paper's multi-threading (§4) with partitions as threads.
    * Space, graph and counter are broadcast; both phases fan the object ids
    * out via `Dataset.mapPartitions` with random partitioning for load
    * balance, exactly as the paper assigns objects to threads.
    */
  def detect(
      spark: SparkSession,
      space: MetricSpace,
      g: ProximityGraph,
      r: Double,
      k: Int,
      usePivotHop: Boolean = true,
      useExactShortcut: Boolean = true,
      counter: ExactCounter = LinearScanCounter(),
      partitions: Int = 0,
  ): DODResult = {
    val n = space.n
    val parts = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    val bSpace = spark.sparkContext.broadcast(space)
    val bGraph = spark.sparkContext.broadcast(g)
    val bCounter = spark.sparkContext.broadcast(counter)
    import spark.implicits._

    val t0 = System.nanoTime()
    val verdictDs = spark
      .range(n)
      .repartition(parts) // random assignment of objects to "threads"
      .mapPartitions { it =>
        val sp = bSpace.value
        val gg = bGraph.value
        it.map { id =>
          val p = id.toInt
          (p, filterVerdict(sp, gg, p, r, k, usePivotHop, useExactShortcut))
        }
      }(Encoders.product[(Int, Byte)])
    val verdicts = verdictDs.collect()
    val t1 = System.nanoTime()

    val candidateIds = verdicts.collect { case (p, Candidate) => p }
    val directOut = verdicts.collect { case (p, DirectOutlier) => p }
    val verified =
      if (candidateIds.isEmpty) Array.empty[(Int, Boolean)]
      else
        spark
          .createDataset(candidateIds.toSeq)
          .repartition(parts)
          .mapPartitions { it =>
            val sp = bSpace.value
            val ec = bCounter.value
            it.map(p => (p, ec.count(sp, p, r, k) < k))
          }(Encoders.product[(Int, Boolean)])
          .collect()
    val t2 = System.nanoTime()
    bSpace.destroy(); bGraph.destroy(); bCounter.destroy()

    val outliers = (directOut ++ verified.collect { case (p, true) => p }).sorted
    DODResult(
      outliers,
      candidates = candidateIds.length,
      falsePositives = verified.count(!_._2),
      directOutliers = directOut.length,
      filterMs = (t1 - t0) / 1000000L,
      verifyMs = (t2 - t1) / 1000000L,
    )
  }

  /** DataFrame wrapper: detected outlier ids as a single-column DataFrame
    * (`id: bigint`) for oracle diffs and spark-submit jobs.
    */
  def detectDF(
      spark: SparkSession,
      space: MetricSpace,
      g: ProximityGraph,
      r: Double,
      k: Int,
  ): DataFrame = {
    import spark.implicits._
    detect(spark, space, g, r, k).outliers.map(_.toLong).toSeq.toDF("id")
  }
}
