package repro.baselines.dita

import org.apache.spark.rdd.RDD
import org.apache.spark.storage.StorageLevel
import scala.util.Random

import repro.core.{MBR, Measure, Point, Trajectory, Frechet, DTW}
import repro.core.partition.IdPartitioner

/** DITA baseline (Shang, Li, Bao — SIGMOD'18), simplified per §VII-A / §VIII:
  * each trajectory is represented by its first point, last point, and up to
  * `nl` high-neighbor-distance pivot points; the local index is a two-level
  * trie (first-point cell → last-point cell) whose leaves hold per-trajectory
  * entries with the pivot MBR. Global partitioning groups trajectories with
  * close first/last points (homogeneous); Heter-DITA (Table VIII) deals the
  * same sorted order round-robin instead.
  *
  * Top-k follows the paper's description: estimate a threshold from a C·k
  * sample, repeatedly halve it while the index counts more than C·k
  * candidates, then run a range query and refine; the threshold doubles until
  * the k-th exact distance falls inside it (exactness guarantee).
  *
  * Supports Fréchet and DTW — the first/last-point bounds require
  * order-sensitive measures, so Hausdorff is unsupported ("/" in Table IV),
  * as in the paper.
  */
object DITA {

  final case class Entry(tid: Int, first: Point, last: Point, pmbr: MBR, len: Int)
  final case class Node2(lastMbr: MBR, entries: Array[Entry])
  final case class Node1(firstMbr: MBR, children: Array[Node2])
  final case class Part(trajs: Array[Trajectory], roots: Array[Node1])

  /** Lower bound of the distance from q to the trajectory behind `e`: exact
    * first/last point terms plus the pivot-MBR to query-MBR term — valid for
    * Fréchet (corner alignments) and DTW (pair (1,1)/(m,n) always aligned;
    * every pivot matched to some query point).
    */
  private def entryLB(q: Array[Point], qMbr: MBR, e: Entry): Double = {
    var lb = math.max(q.head.dist(e.first), q.last.dist(e.last))
    val pm = qMbr.minDist(e.pmbr)
    if (pm > lb) lb = pm
    lb
  }

  private def visitCandidates(
      part: Part, q: Array[Point], qMbr: MBR, theta: Double,
  )(f: Entry => Unit): Unit = {
    part.roots.foreach { n1 =>
      if (n1.firstMbr.minDist(q.head) <= theta) {
        n1.children.foreach { n2 =>
          if (n2.lastMbr.minDist(q.last) <= theta) {
            n2.entries.foreach { e =>
              if (entryLB(q, qMbr, e) <= theta) f(e)
            }
          }
        }
      }
    }
  }

  final class Index(
      val parts: RDD[Part],
      val measure: Measure,
      val samplePool: Array[Trajectory],
      val total: Long,
  ) extends Serializable {

    private def count(q: Array[Point], theta: Double): Long = {
      val qB = parts.sparkContext.broadcast(q)
      val res = parts.map { p =>
        var c = 0L
        visitCandidates(p, qB.value, MBR(qB.value), theta)(_ => c += 1)
        c
      }.fold(0L)(_ + _)
      qB.destroy()
      res
    }

    private def refine(q: Array[Point], theta: Double, k: Int): Array[(Long, Double)] = {
      val qB = parts.sparkContext.broadcast(q)
      val measure0 = measure
      val res = parts.mapPartitions { it =>
        val heap = scala.collection.mutable.PriorityQueue
          .empty[(Long, Double)](Ordering.by(_._2))
        it.foreach { p =>
          visitCandidates(p, qB.value, MBR(qB.value), theta) { e =>
            val t = p.trajs(e.tid)
            val d = measure0.dist(qB.value, t.points)
            if (heap.size < k) heap.enqueue((t.id, d))
            else if (d < heap.head._2) { heap.dequeue(); heap.enqueue((t.id, d)) }
          }
        }
        heap.iterator
      }.collect()
      qB.destroy()
      res.sortBy(r => (r._2, r._1)).take(k)
    }

    def query(q: Array[Point], k: Int, c: Int = 5, seed: Long = 7L): Array[(Long, Double)] = {
      if (k >= total) return refine(q, Double.MaxValue, k)
      val rnd = new Random(seed)
      val sample = rnd.shuffle(samplePool.toVector).take(math.max(c * k, k)).toArray
      val dists = sample.map(t => measure.dist(q, t.points)).sorted
      var theta = math.max(dists(math.min(k - 1, dists.length - 1)), 1e-12)

      // Halve while the index still reports more than C·k candidates.
      var cnt = count(q, theta)
      while (cnt > c.toLong * k && count(q, theta / 2) >= k) {
        theta /= 2
        cnt = count(q, theta)
      }
      var result: Array[(Long, Double)] = null
      while (result == null) {
        val topk = refine(q, theta, k)
        if (topk.length >= k && topk(k - 1)._2 <= theta) result = topk
        else theta *= 2
      }
      result
    }

    /** IS metric: the per-partition tries (entries, MBRs) — trajectories are
      * data, not index, for every algorithm's IS.
      */
    def indexBytes: Long = parts
      .map(p => org.apache.spark.util.SizeEstimator.estimate(p.roots))
      .fold(0L)(_ + _)

    def unpersist(): Unit = parts.unpersist(blocking = true)
  }

  /** Neighbor-distance pivot selection (§VII-A parameters: N_L = 32). */
  private def pivotMbr(t: Trajectory, nl: Int): MBR = {
    val pts = t.points
    if (pts.length <= nl) MBR(pts)
    else {
      val scored = (1 until pts.length - 1).map { i =>
        (pts(i - 1).dist(pts(i)) + pts(i).dist(pts(i + 1)), i)
      }.sorted.reverse.take(nl - 2).map(s => pts(s._2))
      MBR((scored :+ pts.head :+ pts.last).toArray)
    }
  }

  def build(
      trajs: RDD[Trajectory],
      measure: Measure,
      numPartitions: Int,
      nl: Int = 32,
      roundRobin: Boolean = false,
      cellsPerSide: Int = 32,
      samplePoolSize: Int = 2000,
      seed: Long = 11L,
  ): Index = {
    require(measure == Frechet || measure == DTW,
      s"DITA does not support ${measure.name} (first/last-point bounds need order sensitivity)")
    val mbr = trajs.map(_.mbr).reduce(_ union _)
    val u = math.max(math.max(mbr.width, mbr.height), 1e-9)
    def cell(p: Point): Int = {
      val cx = math.min(cellsPerSide - 1, math.max(0, ((p.x - mbr.minX) / u * cellsPerSide).toInt))
      val cy = math.min(cellsPerSide - 1, math.max(0, ((p.y - mbr.minY) / u * cellsPerSide).toInt))
      cx * cellsPerSide + cy
    }

    val total = trajs.count()
    val sorted = trajs
      .map(t => ((cell(t.points.head), cell(t.points.last), t.id), t))
      .sortByKey()
      .values
      .zipWithIndex()
    val assigned = sorted.map { case (t, idx) =>
      val pid =
        if (roundRobin) (idx % numPartitions).toInt
        else math.min(numPartitions - 1, (idx * numPartitions / math.max(total, 1L)).toInt)
      (pid, t)
    }
    val nl0 = nl
    val parts = assigned
      .partitionBy(new IdPartitioner(numPartitions))
      .values
      .mapPartitions { it =>
        val arr = it.toArray
        if (arr.isEmpty) Iterator.empty
        else {
          val entries = arr.zipWithIndex.map { case (t, i) =>
            (cell(t.points.head), cell(t.points.last),
             Entry(i, t.points.head, t.points.last, pivotMbr(t, nl0), t.length))
          }
          val roots = entries
            .groupBy(_._1)
            .map { case (_, g1) =>
              val children = g1
                .groupBy(_._2)
                .map { case (_, g2) =>
                  val es = g2.map(_._3)
                  Node2(MBR(es.map(_.last)), es)
                }
                .toArray
              Node1(MBR(g1.map(_._3.first)), children)
            }
            .toArray
          Iterator.single(Part(arr, roots))
        }
      }
      .persist(StorageLevel.MEMORY_ONLY)
    parts.count()
    val samplePool = trajs.takeSample(withReplacement = false,
      math.min(samplePoolSize, total).toInt, seed)
    new Index(parts, measure, samplePool, total)
  }
}
