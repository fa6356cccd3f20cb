package repro

import org.apache.spark.sql.functions._

/** The DuckDB oracle utility itself: equivalence passes, mismatches fail. */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  test("passes on an identical aggregation") {
    val df = Seq((1L, "a"), (2L, "a"), (3L, "b")).toDF("id", "g")
    val got = df.groupBy("g").agg(count(lit(1)).as("cnt")).orderBy("g")
    Oracle.assertEquivalent(got,
      "SELECT g, count(*) AS cnt FROM t GROUP BY g ORDER BY g", "t" -> df)
  }

  test("fails on a wrong row value") {
    val df = Seq((1L, "a"), (2L, "a")).toDF("id", "g")
    val wrong = Seq(("a", 3L)).toDF("g", "cnt")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT g, count(*) AS cnt FROM t GROUP BY g", "t" -> df)
    }
  }

  test("fails on a missing row") {
    val df = Seq((1L, "a"), (2L, "b")).toDF("id", "g")
    val partial = Seq(("a", 1L)).toDF("g", "cnt")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(partial,
        "SELECT g, count(*) AS cnt FROM t GROUP BY g", "t" -> df)
    }
  }

  test("fails on a column-name mismatch") {
    val df = Seq((1L, "a")).toDF("id", "g")
    val renamed = Seq(("a", 1L)).toDF("g", "n")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(renamed,
        "SELECT g, count(*) AS cnt FROM t GROUP BY g", "t" -> df)
    }
  }

  test("canonicalization tolerates float formatting differences") {
    val df = Seq((1L, 0.1), (2L, 0.2)).toDF("id", "v")
    val got = df.agg(round(sum("v"), 6).as("s"))
    Oracle.assertEquivalent(got,
      "SELECT round(sum(CAST(v AS DOUBLE)), 6) AS s FROM t", "t" -> df)
  }

  test("handles nulls on both sides") {
    val df = Seq((1L, Some("a")), (2L, None)).toDF("id", "g")
    val got = df.select(col("id"), col("g")).orderBy("id")
    Oracle.assertEquivalent(got, "SELECT CAST(id AS BIGINT) AS id, g FROM t ORDER BY id", "t" -> df)
  }
}
