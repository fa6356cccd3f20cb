package repro.jobs

import repro.SparkSpec

/** The spark-submit entrypoints' table functions at a tiny scale (their
  * `main`s only add SparkSession setup + printing around these).
  */
class JobsSpec extends SparkSpec {

  private val tiny = 0.03

  private val jobs: Seq[(String, TableJob)] = Seq(
    "Table1Job" -> Table1Job,
    "Table2Job" -> Table2Job,
    "Table3Job" -> Table3Job,
    "Table4Job" -> Table4Job,
    "Table5bJob" -> Table5bJob,
    "Table6Job" -> Table6Job,
    "Table7Job" -> Table7Job,
    "Table8Job" -> Table8Job,
  )

  for ((name, job) <- jobs) {
    test(s"$name produces a titled, rectangular table") {
      val (title, headers, rows) = job.table(spark, tiny)
      assert(title.startsWith("Table "))
      assert(headers.nonEmpty && rows.nonEmpty)
      rows.foreach(r => assert(r.length == headers.length))
    }
  }

  test("Table5Job checks exactness and returns the running-time table") {
    val (title, headers, rows) = Table5Job.table(spark, tiny)
    assert(title.startsWith("Table 5"))
    assert(headers.length == 9)
    assert(rows.length == 7)
  }

  test("BuildProfileJob's dataset lookup rejects unknown names") {
    assertThrows[IllegalArgumentException](repro.data.Datasets.byName("not-a-dataset"))
  }
}
