package repro.bench

import repro.SparkSpec

/** Table VI: REPOSE query time vs number of pivots N_p ∈ {1,3,5,7,9,11}. */
class TableVIBench extends SparkSpec {
  test("Table VI: query time vs N_p") {
    val out = Tables.tableVI(spark)
    assert(out.size == 36) // 6 N_p values × 2 measures × 3 datasets
    out.values.foreach(qt => assert(qt > 0))
  }
}
