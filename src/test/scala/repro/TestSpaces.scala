package repro

import repro.core.{MetricSpace, StringSpace, VectorMetric, VectorSpace}
import scala.util.Random

/** Small driver-side datasets for unit tests (no Spark needed): clustered
  * inliers + clear outliers, mirroring the bench generators but at test
  * sizes with test-sized `k`.
  */
object TestSpaces {

  def clustered(
      n: Int,
      dim: Int,
      metric: VectorMetric,
      nClusters: Int = 5,
      sigma: Double = 2.0,
      range: Double = 100.0,
      outlierFrac: Double = 0.03,
      seed: Long = 1L,
  ): VectorSpace = {
    val rng = new Random(seed)
    val centers = Array.fill(nClusters, dim)(rng.nextDouble() * range)
    val pts = Array.tabulate(n) { _ =>
      if (rng.nextDouble() < outlierFrac) Array.fill(dim)(rng.nextDouble() * range)
      else {
        val c = rng.nextInt(nClusters)
        Array.tabulate(dim)(i => centers(c)(i) + rng.nextGaussian() * sigma)
      }
    }
    new VectorSpace(pts, metric)
  }

  def angular(
      n: Int,
      dim: Int,
      nClusters: Int = 5,
      sigma: Double = 0.05,
      outlierFrac: Double = 0.03,
      seed: Long = 2L,
  ): VectorSpace = {
    val rng = new Random(seed)
    def unit(): Array[Double] = {
      val v = Array.fill(dim)(rng.nextGaussian())
      val nrm = math.sqrt(v.map(x => x * x).sum)
      v.map(_ / nrm)
    }
    val centers = Array.fill(nClusters)(unit())
    val pts = Array.tabulate(n) { _ =>
      if (rng.nextDouble() < outlierFrac) unit()
      else {
        val c = rng.nextInt(nClusters)
        val v = Array.tabulate(dim)(i => centers(c)(i) + rng.nextGaussian() * sigma)
        val nrm = math.sqrt(v.map(x => x * x).sum)
        v.map(_ / nrm)
      }
    }
    new VectorSpace(pts, VectorMetric.Angular)
  }

  def strings(
      n: Int,
      nRoots: Int = 8,
      outlierFrac: Double = 0.04,
      seed: Long = 3L,
  ): StringSpace = {
    val rng = new Random(seed)
    def word(len: Int): String = new String(Array.fill(len)(('a' + rng.nextInt(26)).toChar))
    val roots = Array.fill(nRoots)(word(8 + rng.nextInt(5)))
    val ws = Array.tabulate(n) { _ =>
      if (rng.nextDouble() < outlierFrac) word(20 + rng.nextInt(9))
      else {
        var w = roots(rng.nextInt(nRoots))
        val edits = rng.nextInt(3)
        for (_ <- 0 until edits) {
          val pos = rng.nextInt(w.length)
          val ch = ('a' + rng.nextInt(26)).toChar
          rng.nextInt(3) match {
            case 0 => w = w.updated(pos, ch)
            case 1 => w = w.substring(0, pos) + ch + w.substring(pos)
            case _ => if (w.length > 4) w = w.substring(0, pos) + w.substring(pos + 1)
          }
        }
        w
      }
    }
    new StringSpace(ws)
  }

  /** Structure-free data — adversarial for graph reachability. */
  def uniform(n: Int, dim: Int, metric: VectorMetric, seed: Long = 4L): VectorSpace = {
    val rng = new Random(seed)
    new VectorSpace(Array.fill(n, dim)(rng.nextDouble() * 100.0), metric)
  }

  /** One named end-to-end scenario: dataset + DOD parameters chosen so both
    * outliers and inliers exist.
    */
  final case class Scenario(name: String, space: MetricSpace, r: Double, k: Int)

  /** Small catalog covering all five distance functions. */
  def scenarios(seed: Long = 10L): Seq[Scenario] = Seq(
    Scenario("l2-clustered", clustered(600, 8, VectorMetric.L2, seed = seed), r = 9.0, k = 10),
    Scenario("l1-clustered", clustered(600, 8, VectorMetric.L1, seed = seed + 1), r = 20.0, k = 10),
    Scenario("l4-clustered", clustered(500, 16, VectorMetric.L4, seed = seed + 2), r = 7.0, k = 8),
    Scenario("angular-clustered", angular(600, 12, seed = seed + 3), r = 0.12, k = 10),
    Scenario("edit-strings", strings(500, seed = seed + 4), r = 4.0, k = 8),
  )
}
