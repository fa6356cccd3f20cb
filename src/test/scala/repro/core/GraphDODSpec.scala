package repro.core

import repro.{SparkSpec, TestSpaces}
import repro.core.{VectorMetric => VM}
import repro.graph.{KGraphBuilder, MRPG, NSW, ProximityGraph}
import scala.util.Random

/** Algorithm 1 end-to-end: exactness for every proximity graph on every
  * scenario and several (r, k) settings, plus accounting invariants and
  * local/Spark-run equivalence.
  */
class GraphDODSpec extends SparkSpec {

  private lazy val runner = new LocalRunner(4)

  private final case class GraphCase(
      name: String,
      build: MetricSpace => ProximityGraph,
      pivotHop: Boolean,
      shortcut: Boolean,
  )

  private lazy val graphCases = Seq(
    GraphCase("NSW", s => NSW.build(s, f = 6, seed = 5), pivotHop = false, shortcut = false),
    GraphCase("KGraph", s => KGraphBuilder.build(s, 10, runner, seed = 5, maxIters = 4),
      pivotHop = false, shortcut = false),
    GraphCase("MRPG-basic", s => MRPG.build(s, 10, runner, seed = 5, basic = true, maxIters = 4)._1,
      pivotHop = true, shortcut = false),
    GraphCase("MRPG", s => MRPG.build(s, 10, runner, seed = 5, basic = false, maxIters = 4)._1,
      pivotHop = true, shortcut = true),
  )

  // cache graphs per (scenario, graph) — they are deterministic
  private val cache = scala.collection.mutable.HashMap.empty[(String, String), ProximityGraph]
  private def graphFor(s: TestSpaces.Scenario, gc: GraphCase): ProximityGraph =
    cache.getOrElseUpdate((s.name, gc.name), gc.build(s.space))

  for (s <- TestSpaces.scenarios(); gc <- graphCases) {
    test(s"${s.name}/${gc.name}: detectLocal is exact at the default (r, k)") {
      val g = graphFor(s, gc)
      val res = GraphDOD.detectLocal(s.space, g, s.r, s.k, gc.pivotHop, gc.shortcut)
      val truth = BruteForce.outliers(s.space, s.r, s.k)
      assert(truth.nonEmpty, "scenario must contain outliers")
      assert(truth.length < s.space.n, "scenario must contain inliers")
      assert(res.outliers.toSeq == truth.toSeq)
    }

    test(s"${s.name}/${gc.name}: exact under varied r and k") {
      val g = graphFor(s, gc)
      for ((rf, k2) <- Seq((0.6, 3), (1.4, s.k), (1.0, 2 * s.k))) {
        val r2 = s.r * rf
        val res = GraphDOD.detectLocal(s.space, g, r2, k2, gc.pivotHop, gc.shortcut)
        assert(res.outliers.toSeq == BruteForce.outliers(s.space, r2, k2).toSeq, s"r=$r2 k=$k2")
      }
    }
  }

  for (gc <- graphCases) {
    test(s"${gc.name}: accounting — candidates = falsePositives + verified outliers") {
      val s = TestSpaces.scenarios().head
      val g = graphFor(s, gc)
      val res = GraphDOD.detectLocal(s.space, g, s.r, s.k, gc.pivotHop, gc.shortcut)
      val verifiedOutliers = res.outliers.length - res.directOutliers
      assert(res.candidates == res.falsePositives + verifiedOutliers)
      if (!gc.shortcut) assert(res.directOutliers == 0)
    }
  }

  test("Spark detect equals detectLocal on every scenario (MRPG)") {
    for (s <- TestSpaces.scenarios()) {
      val (g, _) = MRPG.build(s.space, 10, runner, seed = 6, maxIters = 4)
      val local = GraphDOD.detectLocal(s.space, g, s.r, s.k)
      val dist = GraphDOD.detect(spark, s.space, g, s.r, s.k)
      assert(dist.outliers.toSeq == local.outliers.toSeq, s.name)
      assert(dist.candidates == local.candidates, s.name)
      assert(dist.falsePositives == local.falsePositives, s.name)
      assert(dist.directOutliers == local.directOutliers, s.name)
    }
  }

  test("Spark detect is invariant to the partition count") {
    val s = TestSpaces.scenarios()(1)
    val (g, _) = MRPG.build(s.space, 10, runner, seed = 7, maxIters = 4)
    val results = Seq(1, 3, 16).map(p =>
      GraphDOD.detect(spark, s.space, g, s.r, s.k, partitions = p).outliers.toSeq)
    assert(results.distinct.size == 1)
  }

  test("detectDF returns the outlier ids as a DataFrame") {
    val s = TestSpaces.scenarios().head
    val (g, _) = MRPG.build(s.space, 10, runner, seed = 8, maxIters = 4)
    val df = GraphDOD.detectDF(spark, s.space, g, s.r, s.k)
    assert(df.columns.toSeq == Seq("id"))
    val got = df.collect().map(_.getLong(0).toInt).sorted.toSeq
    assert(got == BruteForce.outliers(s.space, s.r, s.k).toSeq)
  }

  test("VP-tree verification yields the same result as linear-scan verification") {
    val s = TestSpaces.scenarios().head
    val (g, _) = MRPG.build(s.space, 10, runner, seed = 9, maxIters = 4)
    val tree = VPTree.build(s.space, 16, seed = 3)
    val a = GraphDOD.detectLocal(s.space, g, s.r, s.k, counter = LinearScanCounter())
    val b = GraphDOD.detectLocal(s.space, g, s.r, s.k, counter = VPTreeCounter(tree))
    assert(a.outliers.toSeq == b.outliers.toSeq)
    assert(a.falsePositives == b.falsePositives)
  }

  test("degenerate k=1 and huge k stay exact (MRPG)") {
    val s = TestSpaces.scenarios()(2)
    val (g, _) = MRPG.build(s.space, 8, runner, seed = 10, maxIters = 4)
    for (k <- Seq(1, s.space.n - 1)) {
      val res = GraphDOD.detectLocal(s.space, g, s.r, k)
      assert(res.outliers.toSeq == BruteForce.outliers(s.space, s.r, k).toSeq, s"k=$k")
    }
  }

  test("r=0 marks everything an outlier; huge r marks nothing (MRPG)") {
    val s = TestSpaces.scenarios().head
    val (g, _) = MRPG.build(s.space, 8, runner, seed = 11, maxIters = 4)
    val all = GraphDOD.detectLocal(s.space, g, 0.0, 2)
    assert(all.outliers.length == s.space.n)
    val none = GraphDOD.detectLocal(s.space, g, 1e9, 2)
    assert(none.outliers.isEmpty)
  }

  test("empty-adjacency graph still yields exact results (all candidates verified)") {
    val s = TestSpaces.scenarios().head
    val g = ProximityGraph.plain(Array.fill(s.space.n)(Array.empty[Int]))
    val res = GraphDOD.detectLocal(s.space, g, s.r, s.k, usePivotHop = false, useExactShortcut = false)
    assert(res.outliers.toSeq == BruteForce.outliers(s.space, s.r, s.k).toSeq)
    assert(res.candidates == s.space.n) // nothing gets filtered
  }

  test("a better graph filters more: MRPG candidates <= empty-graph candidates") {
    val s = TestSpaces.scenarios().head
    val (g, _) = MRPG.build(s.space, 10, runner, seed = 12, maxIters = 4)
    val res = GraphDOD.detectLocal(s.space, g, s.r, s.k)
    assert(res.candidates + res.directOutliers < s.space.n)
  }

  test("filtering time and verification time are reported non-negative") {
    val s = TestSpaces.scenarios().head
    val (g, _) = MRPG.build(s.space, 10, runner, seed = 13, maxIters = 4)
    val res = GraphDOD.detectLocal(s.space, g, s.r, s.k)
    assert(res.filterMs >= 0 && res.verifyMs >= 0)
    assert(res.totalMs == res.filterMs + res.verifyMs)
  }

  test("random adversarial spaces: MRPG detection stays exact (20 draws)") {
    val rng = new Random(99)
    for (i <- 0 until 20) {
      val space = TestSpaces.uniform(120 + rng.nextInt(80), 3, VM.L2, seed = 1000 + i)
      val (g, _) = MRPG.build(space, 6, runner, seed = i, maxIters = 3)
      val r = 10.0 + rng.nextDouble() * 40.0
      val k = 1 + rng.nextInt(8)
      val res = GraphDOD.detectLocal(space, g, r, k)
      assert(res.outliers.toSeq == BruteForce.outliers(space, r, k).toSeq, s"draw $i r=$r k=$k")
    }
  }
}
