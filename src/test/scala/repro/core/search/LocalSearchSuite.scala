package repro.core.search

import org.scalatest.funsuite.AnyFunSuite

import repro.TestUtils
import repro.core._
import repro.core.rptrie.{RPTrie, SuccinctRPTrie, TrieAccess}

/** Exactness of the best-first local search (Algorithm 2): for every measure,
  * trie variant (plain/optimized, pointer/succinct), grid resolution, and k,
  * the result must match brute force.
  */
class LocalSearchSuite extends AnyFunSuite {

  private val measures: Seq[Measure] = Seq(
    Hausdorff, Frechet, DTW, ERP(Point(5, 5)), LCSS(1.0), EDR(1.0))

  private val trajs = TestUtils.randomTrajs(150, maxLen = 14, seed = 71L)
  private val queries = Seq(
    TestUtils.randomQuery(6, seed = 73L),
    TestUtils.randomQuery(12, seed = 79L),
  )

  for {
    m <- measures
    optimized <- Seq(false, true)
    succinct <- Seq(false, true)
    k <- Seq(1, 5, 20)
  } {
    val label = s"${m.name} optimized=$optimized succinct=$succinct k=$k"
    test(s"topK matches brute force: $label") {
      val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
      val ptr = RPTrie.build(trajs, grid, m, np = 3, optimized = optimized)
      val trie: TrieAccess = if (succinct) SuccinctRPTrie.encode(ptr) else ptr
      queries.foreach { q =>
        val got = LocalSearch.topK(trie, trajs, q, k)
        val expected = TestUtils.bruteTopK(trajs, q, k, m)
        TestUtils.assertTopKEqual(got, expected, trajs, q, m)
      }
    }
  }

  test("k larger than dataset returns all trajectories") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
    val small = trajs.take(7)
    val trie = RPTrie.build(small, grid, Hausdorff)
    val got = LocalSearch.topK(trie, small, queries.head, 100)
    assert(got.length == 7)
  }

  test("k = 0 returns empty") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
    val trie = RPTrie.build(trajs, grid, Hausdorff)
    assert(LocalSearch.topK(trie, trajs, queries.head, 0).isEmpty)
  }

  test("results are sorted by ascending distance") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
    val trie = RPTrie.build(trajs, grid, Frechet)
    val got = LocalSearch.topK(trie, trajs, queries.head, 25)
    assert(got.map(_._2).toSeq == got.map(_._2).sorted.toSeq)
  }

  test("finer grids still return exact results (delta sweep)") {
    for (delta <- Seq(0.25, 0.5, 2.0, 5.0)) {
      val grid = ZGrid.fit(MBR(0, 0, 10, 10), delta)
      val trie = RPTrie.build(trajs, grid, Hausdorff, np = 3)
      val got = LocalSearch.topK(trie, trajs, queries.head, 10)
      val expected = TestUtils.bruteTopK(trajs, queries.head, 10, Hausdorff)
      TestUtils.assertTopKEqual(got, expected, trajs, queries.head, Hausdorff)
    }
  }

  test("pivot counts sweep preserves exactness (N_p in 0,1,5,9)") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
    for (np <- Seq(0, 1, 5, 9)) {
      val trie = RPTrie.build(trajs, grid, Hausdorff, np = np)
      val got = LocalSearch.topK(trie, trajs, queries.head, 10)
      val expected = TestUtils.bruteTopK(trajs, queries.head, 10, Hausdorff)
      TestUtils.assertTopKEqual(got, expected, trajs, queries.head, Hausdorff)
    }
  }

  test("pruning actually happens: fewer exact distances than trajectories (Hausdorff)") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 0.5)
    val big = TestUtils.randomTrajs(800, maxLen = 14, seed = 83L)
    val trie = RPTrie.build(big, grid, Hausdorff, np = 5)
    val stats = new LocalSearch.Stats
    LocalSearch.topK(trie, big, queries.head, 5, stats)
    assert(stats.exactDistances < big.length,
      s"no pruning: ${stats.exactDistances} exact distances for ${big.length} trajectories")
  }

  test("best-first early termination visits fewer nodes than the whole trie") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 0.5)
    val big = TestUtils.randomTrajs(800, maxLen = 14, seed = 89L)
    val trie = RPTrie.build(big, grid, Frechet, np = 5)
    val stats = new LocalSearch.Stats
    LocalSearch.topK(trie, big, queries.head, 5, stats)
    assert(stats.nodesPopped < trie.numNodes)
  }

  test("duplicate trajectories share a leaf and are all returned") {
    val base = TestUtils.randomTrajs(5, maxLen = 8, seed = 97L)
    val dup = base ++ base.map(t => Trajectory(t.id + 5, t.points))
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
    val trie = RPTrie.build(dup, grid, Hausdorff)
    val got = LocalSearch.topK(trie, dup, base(0).points, 2)
    assert(got.length == 2)
    assert(got.forall(_._2 <= 1e-9)) // the trajectory and its duplicate
  }

  test("empty trajectory set returns empty result") {
    val grid = ZGrid.fit(MBR(0, 0, 10, 10), 1.0)
    assert(LocalSearch.topK(
      RPTrie.build(Array.empty[Trajectory], grid, Hausdorff),
      Array.empty, queries.head, 3).isEmpty)
  }
}
