package repro.core.rptrie

import scala.collection.mutable
import scala.util.Random

import repro.core.{Measure, Point, Trajectory, ZGrid}

/** Build-time trie node (pointer representation). After `RPTrie.build`
  * finishes, nodes are frozen into flat child arrays in ascending-z order.
  */
final class TrieNode(val z: Int) extends Serializable {
  var childZ: Array[Int] = Array.emptyIntArray
  var childId: Array[Int] = Array.emptyIntArray
  var tids: Array[Int] = Array.emptyIntArray
  var dmax: Double = 0.0
  var maxDev: Double = 0.0
  var hrMin: Array[Double] = null
  var hrMax: Array[Double] = null
}

/** Reference point trie (§III-B) — pointer representation.
  *
  * Holds the grid, the pivot trajectories, and a flat node array (handle 0 is
  * the root). Internal nodes carry HR pivot-distance ranges; accepting nodes
  * additionally carry trajectory ids and `D_max`.
  */
final class RPTrie(
    val grid: ZGrid,
    val measure: Measure,
    val pivots: Array[Array[Point]],
    val nodes: Array[TrieNode],
) extends TrieAccess {
  def numNodes: Int = nodes.length
  def root: Int = 0
  def childCount(v: Int): Int = nodes(v).childZ.length
  def foreachChild(v: Int)(f: (Int, Int) => Unit): Unit = {
    val n = nodes(v)
    var i = 0
    while (i < n.childZ.length) { f(n.childZ(i), n.childId(i)); i += 1 }
  }
  def tids(v: Int): Array[Int] = nodes(v).tids
  def dmax(v: Int): Double = nodes(v).dmax
  def maxDev(v: Int): Double = nodes(v).maxDev
  def hrMin(v: Int, p: Int): Double = nodes(v).hrMin(p)
  def hrMax(v: Int, p: Int): Double = nodes(v).hrMax(p)
}

object RPTrie {

  /** Mutable node used only during construction. */
  private final class BNode(val z: Int) {
    val children = mutable.LinkedHashMap.empty[Int, BNode]
    val tids = mutable.ArrayBuffer.empty[Int]
    var dmax = 0.0
    var maxDev = 0.0
    var hrMin: Array[Double] = null
    var hrMax: Array[Double] = null
    var id = -1
  }

  /** Build an RP-Trie over `trajs` (§III-B).
    *
    * @param optimized use the greedy hitting-set z-value re-arrangement
    *                  (§III-C) — applied only when the measure is order
    *                  independent (Hausdorff); otherwise the order-preserving
    *                  trie is built.
    * @param np          number of pivot trajectories (0 disables `LB_p`;
    *                    forced to 0 for non-metric measures)
    * @param pivotGroups number of random candidate groups scored by pairwise
    *                    distance sum when selecting pivots (§III-B)
    * @param givenPivots pre-selected (global) pivot trajectories — the
    *                    distributed build selects pivots once on the driver
    *                    and broadcasts them; when null, pivots are selected
    *                    locally from `trajs`.
    */
  def build(
      trajs: Array[Trajectory],
      grid: ZGrid,
      measure: Measure,
      np: Int = 5,
      pivotGroups: Int = 10,
      optimized: Boolean = true,
      seed: Long = 42L,
      givenPivots: Array[Array[Point]] = null,
  ): RPTrie = {
    val pivots =
      if (givenPivots != null) { if (measure.isMetric) givenPivots else Array.empty[Array[Point]] }
      else selectPivots(trajs, measure, np, pivotGroups, seed)
    val root = new BNode(-1)
    if (optimized && measure.orderIndependent) {
      val items = mutable.ArrayBuffer.tabulate(trajs.length) { i =>
        (grid.refSet(trajs(i).points), i)
      }
      buildGreedy(root, items)
    } else {
      var i = 0
      while (i < trajs.length) {
        insert(root, grid.refSeq(trajs(i).points), i)
        i += 1
      }
    }
    computePayloads(root, trajs, grid, measure, pivots)
    freeze(root, grid, measure, pivots)
  }

  /** Select `np` pivots by sampling `groups` random groups and keeping the
    * one with the largest pairwise-distance sum (§III-B, after [21]).
    */
  def selectPivots(
      trajs: Array[Trajectory],
      measure: Measure,
      np: Int,
      groups: Int,
      seed: Long,
  ): Array[Array[Point]] = {
    if (np <= 0 || !measure.isMetric || trajs.isEmpty) return Array.empty
    val rnd = new Random(seed)
    val n = math.min(np, trajs.length)
    var best: Array[Int] = null
    var bestScore = -1.0
    var g = 0
    while (g < groups) {
      val pick = rnd.shuffle(trajs.indices.toVector).take(n).toArray
      var score = 0.0
      var i = 0
      while (i < n) {
        var j = i + 1
        while (j < n) {
          score += measure.dist(trajs(pick(i)), trajs(pick(j)))
          j += 1
        }
        i += 1
      }
      if (score > bestScore) { bestScore = score; best = pick }
      g += 1
    }
    best.map(trajs(_).points.clone())
  }

  private def insert(root: BNode, zs: Array[Int], tid: Int): Unit = {
    var cur = root
    var i = 0
    while (i < zs.length) {
      cur = cur.children.getOrElseUpdate(zs(i), new BNode(zs(i)))
      i += 1
    }
    cur.tids += tid
  }

  /** Greedy hitting-set construction (§III-C + Appendix B): at every level,
    * repeatedly promote the currently most frequent z-value to a child node,
    * claim every remaining set containing it, and subtract the claimed sets'
    * frequencies (the appendix's `C(Z) − C(Z^z)` differencing).
    */
  private def buildGreedy(
      node: BNode,
      items: mutable.ArrayBuffer[(Array[Int], Int)],
  ): Unit = {
    var remaining = mutable.ArrayBuffer.empty[(Array[Int], Int)]
    items.foreach { it =>
      if (it._1.isEmpty) node.tids += it._2 else remaining += it
    }
    if (remaining.isEmpty) return
    val counts = mutable.HashMap.empty[Int, Int]
    remaining.foreach(_._1.foreach(z => counts.update(z, counts.getOrElse(z, 0) + 1)))
    while (remaining.nonEmpty) {
      // Most frequent z-value; ties broken by smallest z for determinism.
      var bestZ = -1; var bestC = -1
      counts.foreach { case (z, c) =>
        if (c > bestC || (c == bestC && z < bestZ)) { bestZ = z; bestC = c }
      }
      val hit = mutable.ArrayBuffer.empty[(Array[Int], Int)]
      val miss = mutable.ArrayBuffer.empty[(Array[Int], Int)]
      remaining.foreach { it =>
        if (java.util.Arrays.binarySearch(it._1, bestZ) >= 0) hit += it else miss += it
      }
      hit.foreach(_._1.foreach { z =>
        val c = counts(z) - 1
        if (c == 0) counts.remove(z) else counts.update(z, c)
      })
      val child = new BNode(bestZ)
      node.children.update(bestZ, child)
      buildGreedy(child, hit.map { case (zs, tid) => (zs.filter(_ != bestZ), tid) })
      remaining = miss
    }
  }

  /** Compute accepting-node payloads (HR point values, D_max) by DFS carrying
    * the z-path, then propagate HR ranges and maxDev bottom-up.
    */
  private def computePayloads(
      root: BNode,
      trajs: Array[Trajectory],
      grid: ZGrid,
      measure: Measure,
      pivots: Array[Array[Point]],
  ): Unit = {
    val np = pivots.length
    val path = mutable.ArrayBuffer.empty[Int]

    def visit(node: BNode): Unit = {
      node.hrMin = Array.fill(np)(Double.MaxValue)
      node.hrMax = Array.fill(np)(Double.MinValue)
      if (node.tids.nonEmpty) {
        val refPts = grid.refPoints(path.toArray)
        var p = 0
        while (p < np) {
          val d = measure.dist(refPts, pivots(p))
          node.hrMin(p) = d; node.hrMax(p) = d
          p += 1
        }
        var dm = 0.0
        node.tids.foreach { tid =>
          val d = measure.dist(trajs(tid).points, refPts)
          if (d > dm) dm = d
        }
        node.dmax = dm
        node.maxDev = dm
      }
      node.children.valuesIterator.foreach { c =>
        path += c.z
        visit(c)
        path.remove(path.length - 1)
        var p = 0
        while (p < np) {
          if (c.hrMin(p) < node.hrMin(p)) node.hrMin(p) = c.hrMin(p)
          if (c.hrMax(p) > node.hrMax(p)) node.hrMax(p) = c.hrMax(p)
          p += 1
        }
        if (c.maxDev > node.maxDev) node.maxDev = c.maxDev
      }
    }
    visit(root)
  }

  /** Freeze into the flat pointer representation: BFS handle assignment with
    * children canonically sorted by z (bitmap iteration order in the succinct
    * encoding), so both representations traverse identically.
    */
  private def freeze(
      root: BNode,
      grid: ZGrid,
      measure: Measure,
      pivots: Array[Array[Point]],
  ): RPTrie = {
    val order = mutable.ArrayBuffer.empty[BNode]
    val queue = mutable.Queue(root)
    while (queue.nonEmpty) {
      val n = queue.dequeue()
      n.id = order.length
      order += n
      n.children.values.toArray.sortBy(_.z).foreach(queue.enqueue(_))
    }
    val nodes = order.map { b =>
      val t = new TrieNode(b.z)
      val sorted = b.children.values.toArray.sortBy(_.z)
      t.childZ = sorted.map(_.z)
      t.childId = sorted.map(_.id)
      t.tids = b.tids.toArray
      t.dmax = b.dmax
      t.maxDev = b.maxDev
      t.hrMin = b.hrMin
      t.hrMax = b.hrMax
      t
    }.toArray
    new RPTrie(grid, measure, pivots, nodes)
  }
}
