package repro.bench

import repro.SparkSpec

/** Table VII: effect of the global partitioning strategy (heterogeneous vs
  * homogeneous vs random) with the RP-Trie as local index everywhere.
  *
  * The load-balance claim is asserted on the workload-imbalance ratio
  * (max/mean per-partition exact-distance computations): heterogeneous
  * placement must balance work better than homogeneous on average.
  */
class TableVIIBench extends SparkSpec {
  test("Table VII: partitioning strategies") {
    val out = Tables.tableVII(spark)
    assert(out.size == 18) // 2 measures × 3 strategies × 3 datasets
    out.values.foreach { case (qt, imb) => assert(qt > 0 && imb >= 1.0) }
    val datasets = Seq("T-drive", "Xi'an", "OSM")
    for (m <- Seq("Hausdorff", "Frechet")) {
      def avgImb(st: String): Double =
        datasets.map(d => out((m, st, d))._2).sum / datasets.size
      assert(avgImb("Heterogeneous") < avgImb("Homogeneous"),
        s"$m: heterogeneous (${avgImb("Heterogeneous")}) should balance better " +
          s"than homogeneous (${avgImb("Homogeneous")})")
    }
  }
}
