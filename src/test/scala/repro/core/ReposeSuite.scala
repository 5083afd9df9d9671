package repro.core

import repro.{SparkSpec, TestUtils}
import repro.core.partition.{Heterogeneous, Homogeneous, RandomPartitioning}

/** End-to-end REPOSE tests: the distributed pipeline (partition → per-
  * partition RP-Trie → best-first local search → global merge) must return
  * exact top-k for every measure and partitioning strategy.
  */
class ReposeSuite extends SparkSpec {

  private val trajs = TestUtils.randomTrajs(500, maxLen = 14, seed = 149L)
  private def rdd = spark.sparkContext.parallelize(trajs.toIndexedSeq, 8)

  private val measures: Seq[Measure] = Seq(
    Hausdorff, Frechet, DTW, ERP(Point(5, 5)), LCSS(1.0), EDR(1.0))

  for (m <- measures) {
    test(s"distributed top-k equals brute force (${m.name})") {
      val cfg = ReposeConfig(delta = 1.0, numPartitions = 6)
      val idx = Repose.build(spark, rdd, m, cfg)
      try {
        for (seed <- Seq(151L, 157L)) {
          val q = TestUtils.randomQuery(8, seed = seed)
          val got = idx.query(q, 12)
          val expected = TestUtils.bruteTopK(trajs, q, 12, m)
          TestUtils.assertTopKEqual(got, expected, trajs, q, m)
        }
      } finally idx.unpersist()
    }
  }

  for (st <- Seq(Heterogeneous, Homogeneous, RandomPartitioning)) {
    test(s"exact results under ${st.name} partitioning") {
      val cfg = ReposeConfig(delta = 1.0, numPartitions = 6, strategy = st)
      val idx = Repose.build(spark, rdd, Hausdorff, cfg)
      try {
        val q = TestUtils.randomQuery(8, seed = 163L)
        TestUtils.assertTopKEqual(
          idx.query(q, 10), TestUtils.bruteTopK(trajs, q, 10, Hausdorff),
          trajs, q, Hausdorff)
      } finally idx.unpersist()
    }
  }

  test("RpTrieRDD has one RpTraj per non-empty partition and covers all trajectories") {
    val cfg = ReposeConfig(delta = 1.0, numPartitions = 6)
    val idx = Repose.build(spark, rdd, Hausdorff, cfg)
    try {
      val counts = idx.rdd.map(_.trajs.length).collect()
      assert(counts.sum == 500)
      assert(counts.length <= 6)
      assert(idx.rdd.getNumPartitions == 6)
    } finally idx.unpersist()
  }

  test("pointer and succinct configurations agree") {
    val q = TestUtils.randomQuery(8, seed = 167L)
    val a = Repose.build(spark, rdd, Frechet, ReposeConfig(delta = 1.0, numPartitions = 4, succinct = true))
    val b = Repose.build(spark, rdd, Frechet, ReposeConfig(delta = 1.0, numPartitions = 4, succinct = false))
    try {
      assert(a.query(q, 10).toSeq == b.query(q, 10).toSeq)
    } finally { a.unpersist(); b.unpersist() }
  }

  test("optimized trie reduces total node count for Hausdorff (Fig. 7 effect)") {
    val a = Repose.build(spark, rdd, Hausdorff,
      ReposeConfig(delta = 1.0, numPartitions = 4, optimizedTrie = true, succinct = false))
    val b = Repose.build(spark, rdd, Hausdorff,
      ReposeConfig(delta = 1.0, numPartitions = 4, optimizedTrie = false, succinct = false))
    try {
      assert(a.totalNodes <= b.totalNodes)
    } finally { a.unpersist(); b.unpersist() }
  }

  test("indexBytes is positive and grows with data") {
    val small = spark.sparkContext.parallelize(trajs.take(50).toIndexedSeq, 4)
    val a = Repose.build(spark, small, Hausdorff, ReposeConfig(delta = 1.0, numPartitions = 4))
    val b = Repose.build(spark, rdd, Hausdorff, ReposeConfig(delta = 1.0, numPartitions = 4))
    try {
      assert(a.indexBytes > 0)
      assert(b.indexBytes > a.indexBytes)
    } finally { a.unpersist(); b.unpersist() }
  }

  test("query results carry correct global trajectory ids (oracle top-k check)") {
    import spark.implicits._
    val cfg = ReposeConfig(delta = 1.0, numPartitions = 6)
    val idx = Repose.build(spark, rdd, Hausdorff, cfg)
    try {
      val q = TestUtils.randomQuery(8, seed = 173L)
      val got = idx.query(q, 10)
      // Brute-force distance table as a DataFrame; top-k via SQL both in
      // Spark and DuckDB must agree with the index result.
      val dists = trajs.map(t => (t.id, Hausdorff.dist(q, t.points))).toSeq
        .toDF("tid", "dist")
      val sparkTop = dists.orderBy($"dist", $"tid").limit(10)
        .selectExpr("tid", "round(dist, 6) as dist6")
      repro.Oracle.assertEquivalent(
        sparkTop,
        "SELECT tid, round(CAST(dist AS DOUBLE), 6) AS dist6 FROM dists " +
          "ORDER BY CAST(dist AS DOUBLE), CAST(tid AS BIGINT) LIMIT 10",
        "dists" -> dists)
      val sqlIds = sparkTop.collect().map(_.getLong(0)).toSeq
      assert(got.map(_._1).toSeq == sqlIds)
    } finally idx.unpersist()
  }

  test("queryBatch answers each query exactly like individual queries") {
    val cfg = ReposeConfig(delta = 1.0, numPartitions = 5)
    val idx = Repose.build(spark, rdd, Hausdorff, cfg)
    try {
      val qs = Array(
        TestUtils.randomQuery(8, seed = 311L),
        TestUtils.randomQuery(5, seed = 313L),
        TestUtils.randomQuery(11, seed = 317L))
      val batch = idx.queryBatch(qs, 8)
      qs.zip(batch).foreach { case (q, got) =>
        TestUtils.assertTopKEqual(got, TestUtils.bruteTopK(trajs, q, 8, Hausdorff),
          trajs, q, Hausdorff)
      }
    } finally idx.unpersist()
  }

  test("LS queryBatch matches brute force per query") {
    val idx = repro.baselines.LinearSearch.build(rdd, Frechet, 5)
    try {
      val qs = Array(
        TestUtils.randomQuery(7, seed = 331L),
        TestUtils.randomQuery(9, seed = 337L))
      val batch = idx.queryBatch(qs, 6)
      qs.zip(batch).foreach { case (q, got) =>
        TestUtils.assertTopKEqual(got, TestUtils.bruteTopK(trajs, q, 6, Frechet),
          trajs, q, Frechet)
      }
    } finally idx.unpersist()
  }

  test("batch of queries is stable across repeated invocations") {
    val cfg = ReposeConfig(delta = 1.0, numPartitions = 4)
    val idx = Repose.build(spark, rdd, Hausdorff, cfg)
    try {
      val q = TestUtils.randomQuery(8, seed = 179L)
      assert(idx.query(q, 5).toSeq == idx.query(q, 5).toSeq)
    } finally idx.unpersist()
  }

  test("grid fits the data with the configured delta") {
    val cfg = ReposeConfig(delta = 0.5, numPartitions = 4)
    val idx = Repose.build(spark, rdd, Hausdorff, cfg)
    try {
      assert(idx.grid.delta >= 0.5 - 1e-12)
      assert(idx.grid.l * idx.grid.delta >= 10.0)
    } finally idx.unpersist()
  }
}
