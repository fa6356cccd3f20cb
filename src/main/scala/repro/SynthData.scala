package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic OLAP data at a configurable scale factor.
  *
  * SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
  * benchmarks use SF~=0.1. Generators are deterministic in (sf, seed) so
  * the DuckDB oracle sees identical input.
  */
object SynthData {
  private val NLineitemPerSf = 6_000_000L
  private val NOrdersPerSf   = 1_500_000L
  private val NCustomerPerSf =   150_000L
  private val NPartPerSf     =   200_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    import spark.implicits._
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf)
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)    as "l_orderkey",
      (rand(seed + 1) * nPart   + 1).cast(LongType)    as "l_partkey",
      (rand(seed + 2) * 7 + 1).cast(IntegerType)       as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(DoubleType)       as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)           as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                  as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                  as "l_tax",
      element_at(array(lit("N"), lit("R"), lit("A")),
                 (rand(seed + 7) * 3 + 1).cast("int")) as "l_returnflag",
      element_at(array(lit("O"), lit("F")),
                 (rand(seed + 8) * 2 + 1).cast("int")) as "l_linestatus",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 9) * 2557).cast("int"))    as "l_shipdate",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    import spark.implicits._
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      $"o_orderkey",
      (rand(seed)     * nCust + 1).cast(LongType)             as "o_custkey",
      element_at(array(lit("O"), lit("F"), lit("P")),
                 (rand(seed + 1) * 3 + 1).cast("int"))         as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)                 as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 3) * 2406).cast("int"))            as "o_orderdate",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      $"c_custkey",
      (rand(seed) * 25).cast(IntegerType)                as "c_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2)            as "c_acctbal",
      element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
                       lit("HOUSEHOLD"), lit("FURNITURE")),
                 (rand(seed + 2) * 5 + 1).cast("int"))   as "c_mktsegment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      $"p_partkey",
      element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
                       lit("LARGE"), lit("ECONOMY"), lit("PROMO")),
                 (rand(seed) * 6 + 1).cast("int"))              as "p_type",
      (rand(seed + 1) * 50 + 1).cast(IntegerType)               as "p_size",
      round(lit(900.0) + ($"p_partkey" % 1000) / 10.0, 2)       as "p_retailprice",
    )
  }

  /** Skewed key column — for join-skew / cardinality-estimation papers. */
  def zipfKeys(spark: SparkSession, rows: Long, nKeys: Long,
               alpha: Double = 1.1, seed: Long = 3): DataFrame = {
    import spark.implicits._
    // Inverse-CDF draw over rank weights 1/k^alpha; good enough for skew.
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nKeys),
            greatest(lit(1L),
              pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType)
            )) as "k",
      rand(seed + 1) as "v",
    )
  }

  def uniformKeys(spark: SparkSession, rows: Long, nKeys: Long, seed: Long = 4): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nKeys + 1).cast(LongType) as "k",
      rand(seed + 1)                          as "v",
    )
  }

  // ===== metric datasets for the DOD reproduction ==========================
  // The paper evaluates on 7 real datasets (Deep/Glove/HEPMASS/MNIST/PAMAP2/
  // SIFT/Words); these synthetic substitutes keep the same distance function
  // and the same shape: clustered inliers (Gaussian clusters with skewed
  // sizes and per-cluster spread) plus a sparse uniform background of clear
  // outliers. Generators are per-row UDFs seeded by (seed, id), so the data
  // is deterministic regardless of partitioning.

  private def rowRng(seed: Long, id: Long): scala.util.Random =
    new scala.util.Random(scala.util.hashing.byteswap64(seed ^ (id * 0x9E3779B97F4A7C15L)))

  /** Zipf-ish cluster pick: weight of cluster c is 1/(c+1). */
  private def pickCluster(rng: scala.util.Random, cum: Array[Double]): Int = {
    val u = rng.nextDouble()
    var i = 0
    while (i < cum.length - 1 && u > cum(i)) i += 1
    i
  }

  private def zipfCum(nClusters: Int): Array[Double] = {
    val w = Array.tabulate(nClusters)(c => 1.0 / (c + 1))
    val s = w.sum
    val cum = new Array[Double](nClusters)
    var acc = 0.0
    var i = 0
    while (i < nClusters) { acc += w(i) / s; cum(i) = acc; i += 1 }
    cum
  }

  /** Clustered vectors: `(id LONG, vec ARRAY<DOUBLE>)`.
    *
    * Inliers: Gaussian around one of `nClusters` centers uniform in
    * `[0, range]^dim`, per-cluster spread `sigma * U(0.7, 1.3)`, skewed
    * (zipf) cluster sizes. Outliers (fraction `outlierFrac`): uniform in
    * the cube — far from every cluster and from each other.
    */
  def clusteredVectors(
      spark: SparkSession,
      n: Long,
      dim: Int,
      nClusters: Int,
      sigma: Double,
      range: Double,
      outlierFrac: Double,
      seed: Long,
      miniFrac: Double = 0.0,
      nMini: Int = 0,
      miniSigmaFactor: Double = 1.3,
  ): DataFrame = {
    val setup = new scala.util.Random(seed)
    val centers = Array.fill(nClusters, dim)(setup.nextDouble() * range)
    val spreads = Array.fill(nClusters)(sigma * (0.7 + 0.6 * setup.nextDouble()))
    val cum = zipfCum(nClusters)
    // sparse mini-clusters: small populations whose neighbor counts straddle
    // k (per-point radial jitter creates a density gradient) — these exercise
    // graph reachability in sparse regions, the source of the paper's false
    // positives, and contribute borderline outliers
    val miniCenters = Array.fill(math.max(nMini, 1), dim)(setup.nextDouble() * range)
    val miniSpreads = Array.fill(math.max(nMini, 1))(
      sigma * miniSigmaFactor * (0.9 + 0.2 * setup.nextDouble()))
    val miniW = Array.fill(math.max(nMini, 1))(0.5 + setup.nextDouble())
    val miniCum = { val s = miniW.sum; var a = 0.0; miniW.map { w => a += w / s; a } }
    val gen = udf { (id: Long) =>
      val rng = rowRng(seed, id)
      val u = rng.nextDouble()
      if (u < outlierFrac) Array.fill(dim)(rng.nextDouble() * range)
      else if (nMini > 0 && u < outlierFrac + miniFrac) {
        val c = pickCluster(rng, miniCum)
        val s = miniSpreads(c) * (0.75 + 0.45 * rng.nextDouble()) // radial jitter
        Array.tabulate(dim)(i => miniCenters(c)(i) + rng.nextGaussian() * s)
      } else {
        val c = pickCluster(rng, cum)
        val s = spreads(c)
        Array.tabulate(dim)(i => centers(c)(i) + rng.nextGaussian() * s)
      }
    }
    spark.range(n).select(col("id"), gen(col("id")).as("vec"))
  }

  /** Clustered unit vectors for the angular metric: `(id, vec)`.
    *
    * Inliers: normalized Gaussian perturbations of random unit centers.
    * Outliers: random unit vectors (nearly orthogonal to everything in
    * moderate dimensions — clear outliers).
    */
  def angularVectors(
      spark: SparkSession,
      n: Long,
      dim: Int,
      nClusters: Int,
      sigma: Double,
      outlierFrac: Double,
      seed: Long,
      miniFrac: Double = 0.0,
      nMini: Int = 0,
      miniSigmaFactor: Double = 1.3,
  ): DataFrame = {
    val setup = new scala.util.Random(seed)
    def unit(rng: scala.util.Random): Array[Double] = {
      val v = Array.fill(dim)(rng.nextGaussian())
      val nrm = math.sqrt(v.map(x => x * x).sum)
      v.map(_ / nrm)
    }
    def around(center: Array[Double], s: Double, rng: scala.util.Random): Array[Double] = {
      val v = Array.tabulate(dim)(i => center(i) + rng.nextGaussian() * s)
      val nrm = math.sqrt(v.map(x => x * x).sum)
      v.map(_ / nrm)
    }
    val centers = Array.fill(nClusters)(unit(setup))
    val spreads = Array.fill(nClusters)(sigma * (0.7 + 0.6 * setup.nextDouble()))
    val cum = zipfCum(nClusters)
    val miniCenters = Array.fill(math.max(nMini, 1))(unit(setup))
    val miniSpreads = Array.fill(math.max(nMini, 1))(
      sigma * miniSigmaFactor * (0.9 + 0.2 * setup.nextDouble()))
    val miniW = Array.fill(math.max(nMini, 1))(0.5 + setup.nextDouble())
    val miniCum = { val s = miniW.sum; var a = 0.0; miniW.map { w => a += w / s; a } }
    val gen = udf { (id: Long) =>
      val rng = rowRng(seed, id)
      val u = rng.nextDouble()
      if (u < outlierFrac) unit(rng)
      else if (nMini > 0 && u < outlierFrac + miniFrac) {
        val c = pickCluster(rng, miniCum)
        around(miniCenters(c), miniSpreads(c) * (0.75 + 0.45 * rng.nextDouble()), rng)
      } else {
        val c = pickCluster(rng, cum)
        around(centers(c), spreads(c), rng)
      }
    }
    spark.range(n).select(col("id"), gen(col("id")).as("vec"))
  }

  /** Edit-distance strings: `(id LONG, word STRING)`.
    *
    * Inliers: a root word (length 8-12) with up to 2 random edits, so
    * co-members stay within edit distance 4 of each other. Outliers: long
    * random strings (length 20-28) — far from every root and from each
    * other (the paper notes Words outliers have large "dimensionality",
    * i.e. length; matched here).
    */
  def editWords(
      spark: SparkSession,
      n: Long,
      nRoots: Int,
      outlierFrac: Double,
      seed: Long,
      sparseFrac: Double = 0.0,
      nSparseRoots: Int = 0,
  ): DataFrame = {
    val setup = new scala.util.Random(seed)
    def randomWord(rng: scala.util.Random, len: Int): String =
      new String(Array.fill(len)(('a' + rng.nextInt(26)).toChar))
    val roots = Array.fill(nRoots)(randomWord(setup, 8 + setup.nextInt(5)))
    // sparse root families: few members, up to 4 edits — pairwise distances
    // straddle a typical r, so their neighbor counts hover around k
    val sparseRoots = Array.fill(math.max(nSparseRoots, 1))(randomWord(setup, 9 + setup.nextInt(5)))
    val cum = zipfCum(nRoots)
    val gen = udf { (id: Long) =>
      val rng = rowRng(seed, id)
      val u = rng.nextDouble()
      if (u < outlierFrac) randomWord(rng, 20 + rng.nextInt(9))
      else {
        val sparse = nSparseRoots > 0 && u < outlierFrac + sparseFrac
        val root =
          if (sparse) sparseRoots(rng.nextInt(sparseRoots.length))
          else roots(pickCluster(rng, cum))
        var w = root
        val edits = if (sparse) 1 + rng.nextInt(4) else rng.nextInt(3)
        var e = 0
        while (e < edits) {
          val op = rng.nextInt(3)
          val pos = rng.nextInt(w.length)
          val ch = ('a' + rng.nextInt(26)).toChar
          w = op match {
            case 0 => w.updated(pos, ch) // substitution
            case 1 => w.substring(0, pos) + ch + w.substring(pos) // insertion
            case _ if w.length > 4 => w.substring(0, pos) + w.substring(pos + 1) // deletion
            case _ => w.updated(pos, ch)
          }
          e += 1
        }
        w
      }
    }
    spark.range(n).select(col("id"), gen(col("id")).as("word"))
  }
}
