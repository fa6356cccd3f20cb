package repro.core

import java.util.concurrent.atomic.LongAdder

/** Wraps a metric space and counts distance evaluations — the cost model
  * every algorithm in the paper is analyzed under, and a wall-clock-free
  * way to compare algorithms at reduced scale (Spark job overhead would
  * otherwise floor the sub-second runs).
  *
  * In `local[*]` mode a broadcast value is shared by reference inside the
  * one JVM, so executor-side evaluations land in the same adder; callers
  * read [[evaluations]] before/after a run.
  */
final class CountingSpace(val base: MetricSpace) extends MetricSpace {
  private val adder = new LongAdder

  def n: Int = base.n
  def dist(i: Int, j: Int): Double = { adder.increment(); base.dist(i, j) }
  def dataBytes: Long = base.dataBytes

  def evaluations: Long = adder.sum()
}
