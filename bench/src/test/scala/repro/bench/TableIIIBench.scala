package repro.bench

import repro.SparkSpec

/** Table III analog: prints statistics of the seven scaled dataset analogs. */
class TableIIIBench extends SparkSpec {
  test("Table III: dataset statistics") {
    val rows = Tables.tableIII(spark)
    assert(rows.size == 7)
    rows.foreach { case (name, n, avgLen, spanX, spanY) =>
      assert(n > 0, s"$name empty")
      assert(avgLen >= 10.0, s"$name avgLen $avgLen below preprocessing floor")
      assert(spanX > 0 && spanY > 0)
    }
  }
}
