package repro.bench

import repro.SparkSpec
import repro.tables.{BenchContext, TableFmt}

/** Base for the per-table benchmark suites.
  *
  * All suites share the JVM-wide [[BenchContext]] caches, so datasets,
  * indexes, ground truth and DOD runs are computed once regardless of suite
  * order. `BENCH_SCALE` (default 1.0) scales every dataset's cardinality.
  */
trait BenchSuite extends SparkSpec {
  val scale: Double = BenchContext.DefaultScale

  /** Prints the rendered table so `sbt "bench/test" | tee bench_output.txt`
    * captures it alongside the assertions.
    */
  def printTable(t: (String, Seq[String], Seq[Seq[String]])): Unit = {
    val rendered = TableFmt.render(t._1, t._2, t._3)
    println()
    println(rendered)
    println()
  }

  def secCell(s: String): Double = s.toDouble
}
