package repro.core.search

import scala.collection.mutable

import repro.core.{Point, Trajectory}
import repro.core.rptrie.TrieAccess

/** Best-first top-k search over an RP-Trie (§IV, Algorithm 2).
  *
  * Nodes are expanded in ascending `LB_o` order. For measures with monotone
  * `LB_o` (Lemmas 2–4) the search terminates as soon as the popped bound
  * reaches the current k-th distance `d_k`. `LB_p` (pivot bound, Eq. 5 — see
  * DESIGN.md for the two-sided correction) prunes whole subtrees via
  * `continue`; `LB_t` (two-side bound, Eq. 3) prunes individual trajectories
  * in accepting nodes.
  */
object LocalSearch {

  /** Optional instrumentation for pruning-effectiveness tests. */
  final class Stats {
    var nodesPopped: Long = 0L
    var nodesPushed: Long = 0L
    var exactDistances: Long = 0L
  }

  private final case class SNode(
      handle: Int,
      lbO: Double,
      lbP: Double,
      refCore: Double,
      state: BState,
  )

  /** Exact top-k of `q` among `trajs` under `trie.measure`. Returns at most
    * k (trajectoryId, distance) pairs sorted by ascending distance.
    */
  def topK(
      trie: TrieAccess,
      trajs: Array[Trajectory],
      q: Array[Point],
      k: Int,
      stats: Stats = null,
  ): Array[(Long, Double)] = {
    if (k <= 0 || trajs.isEmpty) return Array.empty
    val measure = trie.measure
    val ops = BoundsOps.forMeasure(measure, trie.grid, q)
    val np = trie.pivots.length
    val dqp = trie.pivots.map(p => measure.dist(q, p))

    // k-bounded max-heap of current best results; d_k = its head when full.
    val best = mutable.PriorityQueue.empty[(Long, Double)](Ordering.by(_._2))
    def dk: Double = if (best.size < k) Double.MaxValue else best.head._2
    def offer(id: Long, d: Double): Unit =
      if (best.size < k) best.enqueue((id, d))
      else if (d < best.head._2) { best.dequeue(); best.enqueue((id, d)) }

    // Pivot bound for a node (both triangle directions, deviation-corrected).
    def pivotLB(v: Int): Double = {
      var lb = 0.0
      var p = 0
      while (p < np) {
        val dev = trie.maxDev(v)
        val a = dqp(p) - trie.hrMax(v, p) - dev
        val b = trie.hrMin(v, p) - dev - dqp(p)
        val x = math.max(a, b)
        if (x > lb) lb = x
        p += 1
      }
      lb
    }

    val pq = mutable.PriorityQueue.empty[SNode](Ordering.by[SNode, Double](_.lbO).reverse)
    pq.enqueue(SNode(trie.root, 0.0, 0.0, 0.0, ops.rootState))

    var done = false
    while (pq.nonEmpty && !done) {
      val t = pq.dequeue()
      if (stats != null) stats.nodesPopped += 1
      if (ops.monotone && t.lbO >= dk) done = true // all remaining ≥ d_k
      else if (t.lbP >= dk || t.lbO >= dk) ()      // subtree pruned; continue
      else {
        val ts = trie.tids(t.handle)
        if (ts.nonEmpty) {
          val dm = trie.dmax(t.handle)
          var i = 0
          while (i < ts.length) {
            val traj = trajs(ts(i))
            if (ops.leafTidLB(t.refCore, dm, traj.length) < dk) {
              val d = measure.dist(q, traj.points)
              if (stats != null) stats.exactDistances += 1
              offer(traj.id, d)
            }
            i += 1
          }
        }
        trie.foreachChild(t.handle) { (z, c) =>
          val ext = ops.extend(t.state, z)
          if (!(ops.monotone && ext.lbO >= dk)) {
            val lp = if (np > 0) pivotLB(c) else 0.0
            if (lp < dk) {
              pq.enqueue(SNode(c, ext.lbO, lp, ext.refCore, ext.state))
              if (stats != null) stats.nodesPushed += 1
            }
          }
        }
      }
    }
    best.toArray.sortBy(r => (r._2, r._1))
  }
}
