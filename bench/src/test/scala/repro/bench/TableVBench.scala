package repro.bench

import repro.SparkSpec

/** Table V: REPOSE query time vs grid side δ (paper's δ values — the analogs
  * keep the paper's spatial spans).
  */
class TableVBench extends SparkSpec {
  test("Table V: query time vs delta") {
    val out = Tables.tableV(spark)
    assert(out.nonEmpty)
    out.values.foreach(qt => assert(qt > 0))
    // 7 δ values × 2 measures × 3 datasets
    assert(out.size == 42)
  }
}
