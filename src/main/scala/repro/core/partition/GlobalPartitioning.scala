package repro.core.partition

import org.apache.spark.Partitioner
import org.apache.spark.rdd.RDD

import repro.core.{MBR, Trajectory}

/** Global partitioning strategies compared in Table VII (§V-A/B). */
sealed trait PartitionStrategy extends Serializable { def name: String }

/** REPOSE's strategy: cluster similar trajectories (geohash-granularity
  * sweep, the SOM-TC reduction of §V-B), then deal cluster members
  * round-robin so every partition receives a similar mixture.
  */
case object Heterogeneous extends PartitionStrategy { val name = "Heterogeneous" }

/** DITA/DFT-style strategy: whole clusters of similar trajectories stay in
  * the same partition (contiguous chunks of the cluster-sorted order).
  */
case object Homogeneous extends PartitionStrategy { val name = "Homogeneous" }

/** Uniform random assignment by trajectory id. */
case object RandomPartitioning extends PartitionStrategy { val name = "Random" }

/** Keys are precomputed partition ids (§V-C: Spark's `Partitioner` extension
  * point carries the strategy).
  */
final class IdPartitioner(n: Int) extends Partitioner {
  def numPartitions: Int = n
  def getPartition(key: Any): Int = key.asInstanceOf[Int]
}

object GlobalPartitioning {

  /** Finest clustering precision: 2^10 × 2^10 cells. */
  private val MaxPrecision = 10

  /** Cell sequence of a trajectory at precision `p` (consecutive-deduped),
    * the geohash encoding of §V-B; coarser keys are bit-shifts of finer ones.
    */
  private def cellSeq(t: Trajectory, mbr: MBR, p: Int): Array[Int] = {
    val side = 1 << p
    val u = math.max(math.max(mbr.width, mbr.height), 1e-9)
    val out = new scala.collection.mutable.ArrayBuffer[Int](t.length)
    var i = 0
    while (i < t.length) {
      val pt = t.points(i)
      var cx = ((pt.x - mbr.minX) / u * side).toInt
      var cy = ((pt.y - mbr.minY) / u * side).toInt
      if (cx >= side) cx = side - 1
      if (cy >= side) cy = side - 1
      if (cx < 0) cx = 0
      if (cy < 0) cy = 0
      val c = (cx << 16) | cy
      if (out.isEmpty || out.last != c) out += c
      i += 1
    }
    out.toArray
  }

  private def coarsen(seq: Array[Int]): Array[Int] = {
    val out = new scala.collection.mutable.ArrayBuffer[Int](seq.length)
    var i = 0
    while (i < seq.length) {
      val cx = (seq(i) >>> 16) >> 1
      val cy = (seq(i) & 0xffff) >> 1
      val c = (cx << 16) | cy
      if (out.isEmpty || out.last != c) out += c
      i += 1
    }
    out.toArray
  }

  private def keyString(seq: Array[Int]): String = seq.mkString(",")

  /** Cluster ids per §V-B: start from the finest granularity and coarsen
    * until the number of clusters drops to ≈ N / numPartitions.
    */
  def clusterKeys(
      trajs: RDD[Trajectory],
      mbr: MBR,
      numPartitions: Int,
  ): RDD[(Long, String)] = {
    val n = trajs.count()
    val target = math.max(numPartitions.toLong, n / math.max(numPartitions, 1))
    var p = MaxPrecision
    var seqs = trajs.map(t => (t.id, cellSeq(t, mbr, p))).persist()
    var keys = seqs.mapValues(keyString)
    var distinct = keys.values.distinct().count()
    while (distinct > target && p > 1) {
      p -= 1
      val next = seqs.mapValues(coarsen).persist()
      seqs.unpersist(blocking = false)
      seqs = next
      keys = seqs.mapValues(keyString)
      distinct = keys.values.distinct().count()
    }
    val out = keys
    seqs.unpersist(blocking = false)
    out
  }

  /** Assign a partition id to every trajectory under the given strategy.
    *
    * Heterogeneous/homogeneous both sort by (cluster id, trajectory id);
    * heterogeneous then deals round-robin, homogeneous cuts contiguous
    * equal-count chunks.
    */
  def assign(
      trajs: RDD[Trajectory],
      strategy: PartitionStrategy,
      numPartitions: Int,
      mbr: MBR,
  ): RDD[(Int, Trajectory)] = strategy match {
    case RandomPartitioning =>
      trajs.map { t =>
        val h = scala.util.hashing.MurmurHash3.stringHash(t.id.toString)
        (math.floorMod(h, numPartitions), t)
      }
    case _ =>
      val keys = clusterKeys(trajs, mbr, numPartitions)
      val n = trajs.count()
      val byId = trajs.map(t => (t.id, t))
      val sorted = byId
        .join(keys)
        .map { case (id, (t, key)) => ((key, id), t) }
        .sortByKey()
        .values
        .zipWithIndex()
      strategy match {
        case Heterogeneous =>
          sorted.map { case (t, idx) => ((idx % numPartitions).toInt, t) }
        case _ =>
          sorted.map { case (t, idx) =>
            (math.min(numPartitions - 1, (idx * numPartitions / math.max(n, 1L)).toInt), t)
          }
      }
  }

  /** Partition an assigned RDD with the custom `Partitioner` and drop keys. */
  def partitioned(
      assigned: RDD[(Int, Trajectory)],
      numPartitions: Int,
  ): RDD[Trajectory] =
    assigned.partitionBy(new IdPartitioner(numPartitions)).values
}
