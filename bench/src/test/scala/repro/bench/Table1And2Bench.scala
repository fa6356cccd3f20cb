package repro.bench

import repro.tables.{BenchContext, Tables}

/** Tables 1–2: dataset statistics and default parameters / outlier ratios. */
class Table1And2Bench extends BenchSuite {

  test("Table 1: dataset statistics (synthetic substitutes)") {
    val t @ (_, _, rows) = Tables.table1(spark, scale)
    printTable(t)
    assert(rows.length == 7)
    // the substitutes keep the paper's distance functions
    assert(rows.map(_.last) == Seq("L2", "Angular", "L1", "L4", "Edit", "L2", "Edit")
      || rows.map(_.last).toSet == Set("L2", "Angular", "L1", "L4", "Edit"))
  }

  test("Table 2: measured outlier ratios sit near the paper's (within 3x, same order)") {
    val t @ (_, _, rows) = Tables.table2(spark, scale)
    printTable(t)
    rows.foreach { row =>
      val measured = row(3).stripSuffix("%").toDouble
      val paper = row(4).stripSuffix("%").toDouble
      assert(measured > 0.0, s"${row.head}: no outliers at the default parameters")
      assert(measured < 3.0 * paper + 1.0,
        s"${row.head}: measured ratio $measured% too far above the paper's $paper%")
    }
    // Words is the clear maximum in the paper — must stay the maximum here
    val ratios = rows.map(r => r.head -> r(3).stripSuffix("%").toDouble).toMap
    assert(ratios("Words") == ratios.values.max)
  }

  test("every dataset has both outliers and inliers at the defaults") {
    BenchContext.allStates(spark, scale).foreach { st =>
      assert(st.truth.nonEmpty, st.spec.name)
      assert(st.truth.length < st.space.n / 10, st.spec.name)
    }
  }
}
