package repro.baselines.dft

import repro.core.{MBR, Point}

/** STR bulk-loaded R-tree over (MBR, payload) entries — the per-partition
  * segment index of the DFT baseline (Xie et al., PVLDB'17).
  *
  * `searchWithin` reports every entry whose MBR lies within `theta` of the
  * query point set, pruning internal nodes by point-set-to-rectangle minimum
  * distance.
  */
final class RTree private (
    val mbrs: Array[MBR],        // node MBRs, leaves first then internals
    val childStart: Array[Int],  // CSR over children (internal nodes) / entries (leaves)
    val childIds: Array[Int],    // child node ids, or ~entryId for leaf slots
    val rootId: Int,
    val entryMbrs: Array[MBR],
) extends Serializable {

  private def minDistToPoints(m: MBR, pts: Array[Point]): Double = {
    var best = Double.MaxValue
    var i = 0
    while (i < pts.length) {
      val d = m.minDist(pts(i))
      if (d < best) best = d
      i += 1
    }
    best
  }

  /** Invoke `f(entryId)` for exactly the entries with
    * minDist(entry MBR, pts) ≤ theta (node MBRs prune, entry MBRs filter).
    */
  def searchWithin(pts: Array[Point], theta: Double)(f: Int => Unit): Unit = {
    val stack = new java.util.ArrayDeque[Integer]()
    stack.push(rootId)
    while (!stack.isEmpty) {
      val v = stack.pop()
      if (minDistToPoints(mbrs(v), pts) <= theta) {
        var i = childStart(v)
        val end = childStart(v + 1)
        while (i < end) {
          val c = childIds(i)
          if (c < 0) { // leaf slot holding an entry
            val e = ~c
            if (minDistToPoints(entryMbrs(e), pts) <= theta) f(e)
          } else stack.push(c)
          i += 1
        }
      }
    }
  }
}

object RTree {

  /** Sort-Tile-Recursive packing with the given fanout. Entries keep their
    * original ids; their MBRs are indexed by id by the caller for the final
    * per-entry distance filter.
    */
  def pack(entries: Array[MBR], fanout: Int = 16): RTree = {
    require(entries.nonEmpty, "RTree of zero entries")
    val n = entries.length

    // Leaf level: STR — sort by x-center, slice, sort slices by y-center.
    val byX = entries.indices.toArray.sortBy(i => entries(i).minX + entries(i).maxX)
    val numLeaves = math.max(1, (n + fanout - 1) / fanout)
    val sliceCount = math.max(1, math.ceil(math.sqrt(numLeaves.toDouble)).toInt)
    val sliceSize = math.max(1, (n + sliceCount - 1) / sliceCount)
    val groups = byX
      .grouped(sliceSize)
      .flatMap { slice =>
        slice.sortBy(i => entries(i).minY + entries(i).maxY).grouped(fanout)
      }
      .toArray

    val mbrs = scala.collection.mutable.ArrayBuffer.empty[MBR]
    val childStart = scala.collection.mutable.ArrayBuffer.empty[Int]
    val childIds = scala.collection.mutable.ArrayBuffer.empty[Int]
    childStart += 0

    var level: Array[Int] = groups.map { g =>
      val id = mbrs.length
      mbrs += g.map(entries(_)).reduce(_ union _)
      childIds ++= g.map(~_)
      childStart += childIds.length
      id
    }

    while (level.length > 1) {
      val next = level
        .sortBy(v => mbrs(v).minX + mbrs(v).maxX)
        .grouped(fanout)
        .map { g =>
          val id = mbrs.length
          mbrs += g.map(mbrs(_)).reduce(_ union _)
          childIds ++= g
          childStart += childIds.length
          id
        }
        .toArray
      level = next
    }

    new RTree(mbrs.toArray, childStart.toArray, childIds.toArray, level(0), entries)
  }
}
