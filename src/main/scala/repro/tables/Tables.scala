package repro.tables

import org.apache.spark.sql.SparkSession
import repro.data.Datasets

/** One harness per evaluation table. Each `compute` returns
  * `(title, headers, rows)`; jobs print them, bench suites additionally
  * assert the paper's qualitative shape. Paper values are recorded in
  * EXPERIMENTS.md next to measured output.
  */
object Tables {

  /** Table 1: dataset statistics (ours are the synthetic substitutes). */
  def table1(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      val dim = if (st.spec.metric == "Edit") "1-45" else st.spec.dim.toString
      Seq(st.spec.paperName, st.space.n.toString, dim, st.spec.metric)
    }
    ("Table 1: Datasets (synthetic substitutes)",
      Seq("Dataset", "Cardinality", "Dim", "Distance"), rows)
  }

  /** Table 2: default parameters and the measured outlier ratio. */
  def table2(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      Seq(
        st.spec.paperName,
        st.spec.r.toString,
        st.spec.k.toString,
        f"${st.outlierRatio}%.2f%%",
        f"${st.spec.paperRatio}%.2f%%",
      )
    }
    ("Table 2: Default parameters",
      Seq("Dataset", "r", "k", "Outlier ratio", "Paper ratio"), rows)
  }

  /** Table 3: pre-processing (graph build) time per proximity graph [sec]. */
  def table3(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      Seq(st.spec.paperName) ++ st.graphNames.map(g => TableFmt.sec(st.graph(g).buildMs))
    }
    ("Table 3: Pre-processing time [sec]",
      Seq("Dataset", "NSW", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  /** Table 4: decomposed pre-processing time on Glove [sec]. KGraph has only
    * the NNDescent stage; MRPG(-basic) decompose into the four MRPG steps.
    */
  def table4(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val st = BenchContext.state(spark, Datasets.glove, scale)
    val kg = st.graph("KGraph")
    val basic = st.graph("MRPG-basic").stats.get
    val full = st.graph("MRPG").stats.get
    val rows = Seq(
      Seq("NNDescent(+)", TableFmt.sec(kg.buildMs), TableFmt.sec(basic.nnDescentMs),
        TableFmt.sec(full.nnDescentMs)),
      Seq("Connect-SubGraphs", "-", TableFmt.sec(basic.connectMs), TableFmt.sec(full.connectMs)),
      Seq("Remove-Detours", "-", TableFmt.sec(basic.removeDetoursMs),
        TableFmt.sec(full.removeDetoursMs)),
      Seq("Remove-Links", "-", TableFmt.sec(basic.removeLinksMs),
        TableFmt.sec(full.removeLinksMs)),
    )
    ("Table 4: Decomposed pre-processing on Glove [sec]",
      Seq("Step", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  /** Table 5: DOD running time of all eight algorithms [sec]. Every cell's
    * outlier set is checked against the brute-force ground truth by
    * [[exactnessViolations]] (the paper's algorithms are exact).
    */
  def table5(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      Seq(
        st.spec.paperName,
        TableFmt.sec(st.nestedLoop.totalMs),
        TableFmt.sec(st.snif.totalMs),
        TableFmt.sec(st.dolphin.totalMs),
        TableFmt.sec(st.vptreeDod.totalMs),
        TableFmt.sec(st.dod("NSW").totalMs),
        TableFmt.sec(st.dod("KGraph").totalMs),
        TableFmt.sec(st.dod("MRPG-basic").totalMs),
        TableFmt.sec(st.dod("MRPG").totalMs),
      )
    }
    ("Table 5: Running time [sec]",
      Seq("Dataset", "Nested-loop", "SNIF", "DOLPHIN", "VP-tree",
        "NSW", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  /** Table 5b (ours): detection-time distance evaluations [millions] for the
    * same eight algorithms. Spark's fixed per-job overhead floors sub-second
    * wall times at reduced scale; distance counts expose the algorithmic
    * cost the paper analyzes (every algorithm is distance-bound).
    */
  def table5b(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      Seq(st.spec.paperName) ++ st.allDists.map { case (_, d) => TableFmt.mdist(d) }
    }
    ("Table 5b: Distance evaluations during detection [millions]",
      Seq("Dataset", "Nested-loop", "SNIF", "DOLPHIN", "VP-tree",
        "NSW", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  /** Every (algorithm, dataset) pair whose detected outlier set differs from
    * the brute-force ground truth. Exactness demands this be empty.
    */
  def exactnessViolations(spark: SparkSession, scale: Double = BenchContext.DefaultScale): Seq[String] =
    BenchContext.allStates(spark, scale).flatMap { st =>
      val truth = st.truth.toSeq
      val results = Seq(
        "Nested-loop" -> st.nestedLoop.outliers.toSeq,
        "SNIF" -> st.snif.outliers.toSeq,
        "DOLPHIN" -> st.dolphin.outliers.toSeq,
        "VP-tree" -> st.vptreeDod.outliers.toSeq,
      ) ++ st.graphNames.map(g => g -> st.dod(g).outliers.toSeq)
      results.collect {
        case (alg, got) if got != truth =>
          s"${st.spec.name}/$alg: got ${got.size} outliers, truth ${truth.size} " +
            s"(spurious=${got.diff(truth).take(5)}, missed=${truth.diff(got).take(5)})"
      }
    }

  /** Table 6: index size [MB] for every algorithm. */
  def table6(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      Seq(
        st.spec.paperName,
        "0.00", // Nested-loop builds no index
        TableFmt.mb(st.snif.indexBytes),
        TableFmt.mb(st.dolphin.indexBytes),
        TableFmt.mb(st.vpTree.sizeBytes),
        TableFmt.mb(st.graph("NSW").graph.sizeBytes),
        TableFmt.mb(st.graph("KGraph").graph.sizeBytes),
        TableFmt.mb(st.graph("MRPG-basic").graph.sizeBytes),
        TableFmt.mb(st.graph("MRPG").graph.sizeBytes),
      )
    }
    ("Table 6: Index size [MB]",
      Seq("Dataset", "Nested-loop", "SNIF", "DOLPHIN", "VP-tree",
        "NSW", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  /** Table 7: false positives remaining after the filtering phase. */
  def table7(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val rows = BenchContext.allStates(spark, scale).map { st =>
      Seq(st.spec.paperName) ++ st.graphNames.map(g => st.dod(g).falsePositives.toString)
    }
    ("Table 7: Number of false positives after the filtering phase",
      Seq("Dataset", "NSW", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  /** Table 8: decomposed detection time on Glove [sec]. */
  def table8(spark: SparkSession, scale: Double = BenchContext.DefaultScale) = {
    val st = BenchContext.state(spark, Datasets.glove, scale)
    val rows = Seq(
      Seq("Filtering") ++ st.graphNames.map(g => TableFmt.sec(st.dod(g).filterMs)),
      Seq("Verification") ++ st.graphNames.map(g => TableFmt.sec(st.dod(g).verifyMs)),
    )
    ("Table 8: Decomposed time of outlier detection on Glove [sec]",
      Seq("Phase", "NSW", "KGraph", "MRPG-basic", "MRPG"), rows)
  }

  def renderAll(spark: SparkSession, scale: Double = BenchContext.DefaultScale): String = {
    val tables = Seq(
      table1(spark, scale), table2(spark, scale), table3(spark, scale),
      table4(spark, scale), table5(spark, scale), table5b(spark, scale),
      table6(spark, scale), table7(spark, scale), table8(spark, scale),
    )
    tables.map { case (t, h, r) => TableFmt.render(t, h, r) }.mkString("\n\n")
  }
}
