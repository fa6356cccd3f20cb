package repro.core

import repro.{SparkSpec, TestSpaces}

/** Distance-evaluation accounting, including through Spark broadcasts. */
class CountingSpaceSpec extends SparkSpec {

  test("counts driver-side evaluations exactly") {
    val cs = new CountingSpace(TestSpaces.clustered(100, 4, VectorMetric.L2, seed = 7))
    assert(cs.evaluations == 0L)
    cs.dist(0, 1); cs.dist(2, 3); cs.dist(0, 1)
    assert(cs.evaluations == 3L)
  }

  test("delegates n, dist values and dataBytes to the base space") {
    val base = TestSpaces.clustered(50, 4, VectorMetric.L2, seed = 8)
    val cs = new CountingSpace(base)
    assert(cs.n == base.n)
    assert(cs.dataBytes == base.dataBytes)
    for (i <- 0 until 10; j <- 0 until 10) assert(cs.dist(i, j) == base.dist(i, j))
  }

  test("executor-side evaluations in local mode land in the same adder") {
    val cs = new CountingSpace(TestSpaces.clustered(200, 4, VectorMetric.L2, seed = 9))
    val before = cs.evaluations
    NestedLoopProbe.run(spark, cs)
    // nested loop with cap=1: at least one distance per object
    assert(cs.evaluations - before >= cs.n.toLong)
  }

  test("a full DOD run reports fewer distance evaluations for MRPG than nested loop") {
    val base = TestSpaces.clustered(600, 6, VectorMetric.L2, seed = 10, outlierFrac = 0.03)
    val runner = new LocalRunner(4)
    val (g, _) = repro.graph.MRPG.build(base, 8, runner, seed = 3, maxIters = 4)

    val csGraph = new CountingSpace(base)
    val gr = GraphDOD.detectLocal(csGraph, g, 9.0, 10)
    val csNested = new CountingSpace(base)
    val truth = BruteForce.outliers(csNested, 9.0, 10)

    assert(gr.outliers.toSeq == truth.toSeq)
    assert(csGraph.evaluations < csNested.evaluations,
      s"graph ${csGraph.evaluations} vs nested ${csNested.evaluations}")
  }
}

/** Minimal Spark fan-out used to verify shared-adder behavior in local mode. */
private object NestedLoopProbe {
  def run(spark: org.apache.spark.sql.SparkSession, cs: CountingSpace): Unit = {
    val bc = spark.sparkContext.broadcast(cs)
    spark.range(cs.n)
      .repartition(4)
      .mapPartitions { it =>
        val sp = bc.value
        it.map(id => BruteForce.countNeighbors(sp, id.toInt, 1e18, 1))
      }(org.apache.spark.sql.Encoders.scalaInt)
      .collect()
    bc.destroy()
  }
}
