package repro.core

import org.apache.spark.sql.{Encoder, Encoders, SparkSession}
import scala.reflect.ClassTag

/** Fan-out of a pure, read-only computation over id ranges `[start, end)`.
  *
  * The paper parallelizes NNDescent's local joins, Remove-Detours' BFS and
  * both DOD phases across OpenMP threads ("each thread independently
  * evaluates assigned objects"). Here a "thread" is a Spark partition:
  * [[SparkRunner]] broadcasts the shared read-only state once per call and
  * runs the chunks via `Dataset.mapPartitions`; [[LocalRunner]] runs them
  * inline, which keeps unit tests fast and lets a test assert both runners
  * build identical graphs.
  *
  * `f` must not mutate `data` — per-chunk results are merged by the caller
  * on the driver (the paper's iteration-synchronous model).
  */
trait ParRunner extends Serializable {
  def runWithData[D: ClassTag, T: ClassTag](n: Int, data: D)(f: (D, Int, Int) => T): Seq[T]

  /** Splits `[0, n)` into at most `parts` contiguous ranges. */
  protected def chunks(n: Int, parts: Int): Seq[(Int, Int)] = {
    if (n <= 0) return Seq.empty
    val p = math.max(1, math.min(parts, n))
    val step = (n + p - 1) / p
    (0 until n by step).map(s => (s, math.min(n, s + step)))
  }
}

/** Sequential in-process runner (deterministic; used by unit tests). */
final class LocalRunner(parts: Int = 8) extends ParRunner {
  def runWithData[D: ClassTag, T: ClassTag](n: Int, data: D)(f: (D, Int, Int) => T): Seq[T] =
    chunks(n, parts).map { case (s, e) => f(data, s, e) }
}

/** Spark-backed runner: broadcast shared state, `mapPartitions` the ranges.
  * Results travel Kryo-encoded wrapped in `Tuple1` (Kryo encoders reject
  * primitive result types like `Long`).
  */
final class SparkRunner(@transient spark: SparkSession, parts: Int) extends ParRunner {
  def runWithData[D: ClassTag, T: ClassTag](n: Int, data: D)(f: (D, Int, Int) => T): Seq[T] = {
    val ranges = chunks(n, parts)
    if (ranges.size <= 1) return ranges.map { case (s, e) => f(data, s, e) }
    val bc = spark.sparkContext.broadcast(data)
    implicit val outEnc: Encoder[Tuple1[T]] =
      Encoders.kryo(ClassTag(classOf[Tuple1[_]]).asInstanceOf[ClassTag[Tuple1[T]]])
    val ds = spark.createDataset(ranges)(Encoders.product[(Int, Int)])
      .repartition(ranges.size)
    val res = ds.mapPartitions(it => it.map { case (s, e) => Tuple1(f(bc.value, s, e)) })
      .collect().map(_._1).toSeq
    bc.destroy()
    res
  }
}
