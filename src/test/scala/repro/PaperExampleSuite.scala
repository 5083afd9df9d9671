package repro

import repro.core._

/** End-to-end reproduction of the paper's running example (Fig. 1,
  * Table II, Example 1) through the full distributed pipeline of every
  * algorithm.
  */
class PaperExampleSuite extends SparkSpec {

  private val trajs = TestUtils.paperTrajs
  private val q = TestUtils.paperQuery
  private def rdd = spark.sparkContext.parallelize(trajs.toIndexedSeq, 2)

  test("REPOSE top-2 on the running example is {tau_1, tau_4} with the paper's distances") {
    val idx = Repose.build(spark, rdd, Hausdorff,
      ReposeConfig(delta = 1.0, numPartitions = 2))
    try {
      val res = idx.query(q, 2)
      assert(res.map(_._1).toSet == Set(1L, 4L))
      assert(math.abs(res(0)._2 - 2.83) < 0.01) // tau_1
      assert(math.abs(res(1)._2 - 3.16) < 0.01) // tau_4
    } finally idx.unpersist()
  }

  test("LS agrees with Example 1 on the running example") {
    val idx = repro.baselines.LinearSearch.build(rdd, Hausdorff, 2)
    try {
      assert(idx.query(q, 2).map(_._1).toSet == Set(1L, 4L))
    } finally idx.unpersist()
  }

  test("DFT agrees with Example 1 on the running example") {
    val idx = repro.baselines.dft.DFT.build(rdd, Hausdorff, 2)
    try {
      assert(idx.query(q, 2).map(_._1).toSet == Set(1L, 4L))
    } finally idx.unpersist()
  }

  test("DITA returns the exact Frechet top-2 on the running example") {
    val idx = repro.baselines.dita.DITA.build(rdd, Frechet, 2)
    try {
      val got = idx.query(q, 2)
      val expected = TestUtils.bruteTopK(trajs, q, 2, Frechet)
      TestUtils.assertTopKEqual(got, expected, trajs, q, Frechet)
    } finally idx.unpersist()
  }

  test("all six measures return exact top-2 on the running example") {
    for (m <- Seq[Measure](Hausdorff, Frechet, DTW, ERP(Point(4, 4)), LCSS(1.0), EDR(1.0))) {
      val idx = Repose.build(spark, rdd, m, ReposeConfig(delta = 1.0, numPartitions = 2))
      try {
        TestUtils.assertTopKEqual(
          idx.query(q, 2), TestUtils.bruteTopK(trajs, q, 2, m), trajs, q, m)
      } finally idx.unpersist()
    }
  }

  test("the example trie on the 8x8 grid discretizes tau_q to 3 cells") {
    val g = TestUtils.paperGrid
    assert(g.refSeq(q).length == 3)
    assert(g.refSeq(q).sameElements(Array(g.zOf(0, 6), g.zOf(2, 6), g.zOf(4, 6))))
  }
}
