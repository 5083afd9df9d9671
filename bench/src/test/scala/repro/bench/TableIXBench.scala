package repro.bench

import repro.SparkSpec

/** Table IX: REPOSE vs Heter-DFT vs DFT (Hausdorff and Fréchet). */
class TableIXBench extends SparkSpec {
  test("Table IX: heterogeneous partitioning applied to DFT") {
    val out = Tables.tableIX(spark)
    assert(out.size == 18) // 2 measures × 3 algorithms × 3 datasets
    out.values.foreach(qt => assert(qt > 0))
  }
}
