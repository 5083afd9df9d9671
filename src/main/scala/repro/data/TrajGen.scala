package repro.data

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.util.Random

import repro.core.{Point, Trajectory}

/** Synthetic trajectory generator — the stand-in for the paper's seven real
  * datasets (Table III). Trajectories are correlated random walks starting
  * from a mixture of `clusters` urban hotspots inside the dataset's spatial
  * span; lengths are lognormal around `avgLen`, clipped to the paper's
  * preprocessing window [10, 1000]. Deterministic in (spec, trajectory id).
  */
object TrajGen {

  /** Shape statistics of a dataset analog (spans in degrees, as Table III). */
  final case class Spec(
      name: String,
      n: Int,
      avgLen: Int,
      spanX: Double,
      spanY: Double,
      clusters: Int = 8,
      seed: Long = 97L,
  )

  /** One trajectory, deterministic in (spec, id). */
  def one(spec: Spec, id: Long): Trajectory = {
    val rnd = new Random(spec.seed * 1000003L + id * 7919L)
    val len = math.max(10, math.min(1000,
      math.round(math.exp(math.log(spec.avgLen.toDouble) + 0.35 * rnd.nextGaussian())).toInt))
    // Hotspot centers are deterministic in the spec seed alone.
    val crnd = new Random(spec.seed)
    val centers = Array.fill(spec.clusters)(
      Point(0.1 * spec.spanX + 0.8 * spec.spanX * crnd.nextDouble(),
            0.1 * spec.spanY + 0.8 * spec.spanY * crnd.nextDouble()))
    val c = centers(rnd.nextInt(centers.length))
    val local = math.min(spec.spanX, spec.spanY) * 0.15
    var x = c.x + local * rnd.nextGaussian() * 0.3
    var y = c.y + local * rnd.nextGaussian() * 0.3
    val step = math.min(spec.spanX, spec.spanY) / 250.0
    var heading = rnd.nextDouble() * 2 * math.Pi
    val pts = new Array[Point](len)
    var i = 0
    while (i < len) {
      x = math.max(0.0, math.min(spec.spanX, x))
      y = math.max(0.0, math.min(spec.spanY, y))
      pts(i) = Point(x, y)
      heading += 0.4 * rnd.nextGaussian()
      val s = step * (0.5 + rnd.nextDouble())
      x += s * math.cos(heading)
      y += s * math.sin(heading)
      i += 1
    }
    Trajectory(id, pts)
  }

  /** The full dataset as an RDD. */
  def generate(spark: SparkSession, spec: Spec, partitions: Int = 16): RDD[Trajectory] =
    spark.sparkContext
      .parallelize(0L until spec.n.toLong, partitions)
      .map(id => one(spec, id))

  /** A deterministic query workload drawn from the same distribution but with
    * ids outside the dataset (fresh walks in the same space), as the paper's
    * uniformly sampled query set.
    */
  def queries(spec: Spec, count: Int): Array[Trajectory] =
    Array.tabulate(count)(i => one(spec, spec.n + 1000L + i))

  /** Per-trajectory statistics as a DataFrame (for Table-III-style summaries
    * and DuckDB oracle checks).
    */
  def statsDF(spark: SparkSession, trajs: RDD[Trajectory]): DataFrame = {
    import spark.implicits._
    trajs.map { t =>
      val m = t.mbr
      (t.id, t.length, m.minX, m.minY, m.maxX, m.maxY)
    }.toDF("id", "len", "minx", "miny", "maxx", "maxy")
  }
}
