package repro.bench

import repro.tables.{BenchContext, Tables}

/** Table 5: running time of all eight algorithms, with exactness checks —
  * the paper's headline result (proximity-graph DOD ≫ scan-based DOD,
  * MRPG the overall winner).
  *
  * Wall-clock at our reduced scale is floored by Spark's fixed per-job
  * overhead, so ordering assertions run on distance evaluations (Table 5b)
  * — the cost model behind the paper's Table 5 — plus aggregate wall checks.
  */
class Table5Bench extends BenchSuite {

  test("every algorithm on every dataset returns exactly the ground-truth outliers") {
    val violations = Tables.exactnessViolations(spark, scale)
    assert(violations.isEmpty, violations.mkString("\n"))
  }

  test("Table 5/5b: graph-based beats scan-based on every dataset; MRPG wins overall") {
    printTable(Tables.table5(spark, scale))
    val t5b @ (_, _, rows) = Tables.table5b(spark, scale)
    printTable(t5b)
    assert(rows.length == 7)

    def col(i: Int) = rows.map(r => r(i).toDouble) // Mdist
    val nested = col(1); val snif = col(2); val dolphin = col(3); val vptree = col(4)
    val nsw = col(5); val kgraph = col(6); val basic = col(7); val mrpg = col(8)

    // headline: on every dataset the best graph algorithm does less distance
    // work than the best scan-based algorithm
    rows.indices.foreach { i =>
      val bestScan = Seq(nested(i), snif(i), dolphin(i), vptree(i)).min
      val bestGraph = Seq(nsw(i), kgraph(i), basic(i), mrpg(i)).min
      assert(bestGraph < bestScan,
        s"${rows(i).head}: best graph ${bestGraph}M dists not below best scan ${bestScan}M")
    }

    // MRPG is the overall winner (paper: bold winner on all 7 datasets).
    // Per dataset we allow slack on the VP-tree-verified datasets, where at
    // container scale verification is already cheap and the §5.5 shortcut
    // has little left to save; the aggregate ordering must be strict.
    rows.indices.foreach { i =>
      val others = Seq(nsw(i), kgraph(i), basic(i))
      assert(mrpg(i) <= others.min * 1.8 + 0.05,
        s"${rows(i).head}: MRPG ${mrpg(i)}M dists vs best other graph ${others.min}M")
    }
    assert(mrpg.sum < basic.sum)
    assert(mrpg.sum < kgraph.sum)
    assert(mrpg.sum < nsw.sum)
    // and MRPG is the outright winner on a majority of datasets
    val wins = rows.indices.count(i => mrpg(i) <= Seq(nsw(i), kgraph(i), basic(i)).min)
    assert(wins >= 4, s"MRPG minimal on only $wins/7 datasets")
  }

  test("MRPG's distance work is a small fraction of the nested loop's (speed-up proxy)") {
    val (_, _, rows) = Tables.table5b(spark, scale)
    val factors = rows.map { r =>
      val nested = r(1).toDouble
      nested / math.max(r(8).toDouble, 0.001)
    }
    println("Nested-loop/MRPG distance-work ratios: " +
      factors.map(f => f"$f%.1fx").mkString(", "))
    factors.zip(rows.map(_.head)).foreach { case (f, name) =>
      assert(f > 3.0, s"$name: only ${f}x less distance work than nested loop")
    }
    assert(factors.max > 10.0)
  }

  test("aggregate wall-clock ordering holds despite the per-job overhead floor") {
    val (_, _, rows) = Tables.table5(spark, scale)
    def col(i: Int) = rows.map(r => secCell(r(i)))
    val scans = (1 to 4).map(col).map(_.sum)
    val mrpg = col(8).sum
    assert(mrpg < scans.max, s"MRPG ${mrpg}s vs slowest scan family ${scans.max}s")
    assert(mrpg <= col(7).sum * 1.2 + 0.5) // not slower than MRPG-basic overall
  }
}
