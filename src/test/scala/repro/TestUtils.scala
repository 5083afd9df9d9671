package repro

import scala.util.Random

import repro.core._

/** Shared helpers for unit and integration tests. */
object TestUtils {

  /** Small in-memory random-walk trajectories (no Spark). */
  def randomTrajs(
      n: Int,
      maxLen: Int = 20,
      span: Double = 10.0,
      seed: Long = 5L,
  ): Array[Trajectory] = {
    val rnd = new Random(seed)
    Array.tabulate(n) { i =>
      val len = 2 + rnd.nextInt(math.max(1, maxLen - 2))
      var x = rnd.nextDouble() * span
      var y = rnd.nextDouble() * span
      val pts = Array.fill(len) {
        x = math.max(0, math.min(span, x + (rnd.nextDouble() - 0.5) * span / 10))
        y = math.max(0, math.min(span, y + (rnd.nextDouble() - 0.5) * span / 10))
        Point(x, y)
      }
      Trajectory(i.toLong, pts)
    }
  }

  def randomQuery(len: Int, span: Double = 10.0, seed: Long = 99L): Array[Point] = {
    val rnd = new Random(seed)
    var x = rnd.nextDouble() * span
    var y = rnd.nextDouble() * span
    Array.fill(len) {
      x = math.max(0, math.min(span, x + (rnd.nextDouble() - 0.5) * span / 10))
      y = math.max(0, math.min(span, y + (rnd.nextDouble() - 0.5) * span / 10))
      Point(x, y)
    }
  }

  /** Ground-truth top-k by exhaustive distance computation. */
  def bruteTopK(
      trajs: Seq[Trajectory],
      q: Array[Point],
      k: Int,
      measure: Measure,
  ): Array[(Long, Double)] =
    trajs.map(t => (t.id, measure.dist(q, t.points)))
      .sortBy(r => (r._2, r._1))
      .take(k)
      .toArray

  /** Top-k equality that is robust to distance ties: the distance sequences
    * must match and every reported (id, distance) must be genuine.
    */
  def assertTopKEqual(
      got: Array[(Long, Double)],
      expected: Array[(Long, Double)],
      trajs: Seq[Trajectory],
      q: Array[Point],
      measure: Measure,
      tol: Double = 1e-9,
  ): Unit = {
    assert(got.length == expected.length,
      s"size mismatch: got ${got.length}, expected ${expected.length}")
    val byId = trajs.map(t => t.id -> t).toMap
    got.foreach { case (id, d) =>
      val actual = measure.dist(q, byId(id).points)
      assert(math.abs(actual - d) <= tol, s"reported distance $d for id $id but actual $actual")
    }
    got.map(_._2).zip(expected.map(_._2)).zipWithIndex.foreach { case ((g, e), i) =>
      assert(math.abs(g - e) <= tol, s"rank $i distance: got $g, expected $e")
    }
  }

  /** Table II trajectories of the paper's running example. */
  def paperTrajs: Array[Trajectory] = Array(
    Trajectory(1, Array(Point(0.5, 7.5), Point(2.5, 7.5), Point(6.5, 7.5), Point(6.5, 4.5))),
    Trajectory(2, Array(Point(1.5, 0.5), Point(2.5, 0.5), Point(2.5, 4.5), Point(4.5, 4.5))),
    Trajectory(3, Array(Point(4.5, 0.5), Point(7.5, 0.5), Point(7.5, 2.5), Point(4.5, 2.5), Point(4.5, 1.5))),
    Trajectory(4, Array(Point(0.5, 7.5), Point(2.5, 7.5), Point(5.5, 7.5), Point(5.5, 3.5))),
    Trajectory(5, Array(Point(1.5, 0.5), Point(2.5, 0.5), Point(2.5, 5.5), Point(0.5, 5.5), Point(0.5, 2.5))),
  )

  def paperQuery: Array[Point] = Array(Point(0.5, 6.5), Point(2.5, 6.5), Point(4.5, 6.5))

  /** The 8×8 grid of Fig. 1 (region [0,8]×[0,8], δ = 1). */
  def paperGrid: ZGrid = ZGrid(0.0, 0.0, 8, 1.0)
}
