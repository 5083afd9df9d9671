package repro.core

/** A sample point with longitude/latitude (treated as planar x/y, as the
  * paper does — all distances are Euclidean in degree space).
  */
final case class Point(x: Double, y: Double) {
  def dist(o: Point): Double = {
    val dx = x - o.x; val dy = y - o.y
    math.sqrt(dx * dx + dy * dy)
  }
}

/** A trajectory: a finite, time-ordered sequence of sample points
  * (Definition 1). `id` is unique within a dataset.
  */
final case class Trajectory(id: Long, points: Array[Point]) {
  def length: Int = points.length

  /** Minimum bounding rectangle of the whole trajectory. */
  def mbr: MBR = MBR(points)

  override def equals(o: Any): Boolean = o match {
    case t: Trajectory => t.id == id && java.util.Arrays.equals(
      points.asInstanceOf[Array[AnyRef]], t.points.asInstanceOf[Array[AnyRef]])
    case _ => false
  }
  override def hashCode(): Int = id.hashCode
}

/** Axis-aligned minimum bounding rectangle. */
final case class MBR(minX: Double, minY: Double, maxX: Double, maxY: Double) {
  /** Smallest MBR covering both `this` and `o`. */
  def union(o: MBR): MBR =
    MBR(math.min(minX, o.minX), math.min(minY, o.minY),
        math.max(maxX, o.maxX), math.max(maxY, o.maxY))

  def width: Double  = maxX - minX
  def height: Double = maxY - minY

  def contains(p: Point): Boolean =
    p.x >= minX && p.x <= maxX && p.y >= minY && p.y <= maxY

  /** Minimum Euclidean distance from a point to this rectangle (0 inside). */
  def minDist(p: Point): Double = {
    val dx = if (p.x < minX) minX - p.x else if (p.x > maxX) p.x - maxX else 0.0
    val dy = if (p.y < minY) minY - p.y else if (p.y > maxY) p.y - maxY else 0.0
    math.sqrt(dx * dx + dy * dy)
  }

  /** Minimum Euclidean distance between two rectangles (0 if overlapping). */
  def minDist(o: MBR): Double = {
    val dx = if (o.maxX < minX) minX - o.maxX else if (o.minX > maxX) o.minX - maxX else 0.0
    val dy = if (o.maxY < minY) minY - o.maxY else if (o.minY > maxY) o.minY - maxY else 0.0
    math.sqrt(dx * dx + dy * dy)
  }
}

object MBR {
  /** MBR of a non-empty point set. */
  def apply(pts: Array[Point]): MBR = {
    require(pts.nonEmpty, "MBR of empty point set")
    var nx = Double.MaxValue; var ny = Double.MaxValue
    var xx = Double.MinValue; var xy = Double.MinValue
    var i = 0
    while (i < pts.length) {
      val p = pts(i)
      if (p.x < nx) nx = p.x
      if (p.y < ny) ny = p.y
      if (p.x > xx) xx = p.x
      if (p.y > xy) xy = p.y
      i += 1
    }
    MBR(nx, ny, xx, xy)
  }
}
