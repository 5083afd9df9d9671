package repro.bench

import repro.SparkSpec
import repro.core.Measure
import repro.data.Datasets

/** Table IV: performance overview — QT / IS / IT for {Hausdorff, Fréchet,
  * DTW} × {REPOSE, DITA, DFT, LS} on all seven dataset analogs. One test per
  * distance (the paper's row groups) so slices can be re-run independently.
  * Numbers are recorded against the paper's in EXPERIMENTS.md.
  */
class TableIVBench extends SparkSpec {

  private def runSlice(measure: Measure): Unit = {
    val cells = Tables.tableIV(spark, measures = Seq(measure))
    val m = measure.name
    for (d <- Datasets.all.map(_.name)) {
      assert(cells((m, "REPOSE", d)).qt > 0, s"REPOSE $m/$d missing")
      assert(cells((m, "REPOSE", d)).isMB > 0)
      assert(cells((m, "REPOSE", d)).itSec > 0)
      assert(cells((m, "DFT", d)).qt > 0)
      assert(cells((m, "LS", d)).qt > 0)
      if (m == "Hausdorff") assert(cells((m, "DITA", d)).qt.isNaN) // "/" row
      else assert(cells((m, "DITA", d)).qt > 0)
      // Shape check: DFT's dual index + segment trees dominate REPOSE's trie.
      assert(cells((m, "DFT", d)).isMB > cells((m, "REPOSE", d)).isMB,
        s"index size shape violated on $m/$d")
    }
  }

  test("Table IV slice: Hausdorff")(runSlice(repro.core.Hausdorff))
  test("Table IV slice: Frechet")(runSlice(repro.core.Frechet))
  test("Table IV slice: DTW")(runSlice(repro.core.DTW))
}
