package repro.bench

import repro.SparkSpec

/** Table VIII: REPOSE vs Heter-DITA vs DITA (DTW and Fréchet) — does the
  * heterogeneous partitioning strategy help DITA too?
  */
class TableVIIIBench extends SparkSpec {
  test("Table VIII: heterogeneous partitioning applied to DITA") {
    val out = Tables.tableVIII(spark)
    assert(out.size == 18) // 2 measures × 3 algorithms × 3 datasets
    out.values.foreach(qt => assert(qt > 0))
  }
}
