package repro

import org.apache.spark.sql.functions._

/** Sanity tests of the DuckDB oracle itself plus oracle-backed checks of the
  * distance-table top-k semantics used by the trajectory pipeline.
  */
class OracleSuite extends SparkSpec {
  import spark.implicits._

  test("oracle accepts an identical aggregation") {
    val df = Seq((1L, 2.0), (2L, 3.0), (1L, 5.0)).toDF("k", "v")
    val agg = df.groupBy($"k").agg(round(sum($"v"), 4) as "s")
    Oracle.assertEquivalent(agg,
      "SELECT k, round(sum(CAST(v AS DOUBLE)), 4) AS s FROM t GROUP BY k",
      "t" -> df)
  }

  test("oracle rejects a wrong result") {
    val df = Seq((1L, 2.0)).toDF("k", "v")
    val wrong = Seq((1L, 99.0)).toDF("k", "s")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT k, CAST(v AS DOUBLE) AS s FROM t", "t" -> df)
    }
  }

  test("oracle rejects column mismatches") {
    val df = Seq((1L, 2.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select($"k" as "wrong"),
        "SELECT k FROM t", "t" -> df)
    }
  }

  test("top-k over a distance table matches DuckDB ORDER BY LIMIT") {
    val trajs = TestUtils.randomTrajs(100, maxLen = 10, seed = 271L)
    val q = TestUtils.randomQuery(8, seed = 277L)
    val dists = trajs.map(t => (t.id, repro.core.Hausdorff.dist(q, t.points)))
      .toSeq.toDF("tid", "dist")
    val top = dists.orderBy($"dist", $"tid").limit(7)
      .selectExpr("tid", "round(dist, 6) as d6")
    Oracle.assertEquivalent(top,
      "SELECT tid, round(CAST(dist AS DOUBLE), 6) AS d6 FROM dists " +
        "ORDER BY CAST(dist AS DOUBLE), CAST(tid AS BIGINT) LIMIT 7",
      "dists" -> dists)
  }

  test("per-partition local top-k union covers the global top-k (merge lemma)") {
    // The driver-side merge in Repose/LS relies on: global top-k ⊆ union of
    // per-partition top-k. Verify on a DataFrame rendition with DuckDB.
    val trajs = TestUtils.randomTrajs(120, maxLen = 8, seed = 281L)
    val q = TestUtils.randomQuery(6, seed = 283L)
    val rows = trajs.map(t => (t.id, t.id % 4, repro.core.Hausdorff.dist(q, t.points)))
      .toSeq.toDF("tid", "pid", "dist")
    val k = 9
    val globalTop = rows.orderBy($"dist", $"tid").limit(k).select($"tid").collect().map(_.getLong(0)).toSet
    val localTops = (0L until 4L).flatMap { p =>
      rows.filter($"pid" === p).orderBy($"dist", $"tid").limit(k)
        .select($"tid").collect().map(_.getLong(0))
    }.toSet
    assert(globalTop.subsetOf(localTops))
  }
}
