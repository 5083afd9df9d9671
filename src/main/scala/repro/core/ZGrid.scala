package repro.core

/** Z-order grid over the square region A enclosing all trajectories (§III-A).
  *
  * The region has side `U`; it is split into an `l × l` grid of cells with
  * side `delta = U / l`, where `l` is a power of two. Each cell has a z-value
  * (Morton code — horizontal bit first, MSB first, per Example 2: x=010,
  * y=101 → z=011001) and a reference point (the cell center).
  */
final case class ZGrid(minX: Double, minY: Double, l: Int, delta: Double)
    extends Serializable {
  require(l >= 2 && (l & (l - 1)) == 0, s"grid side $l must be a power of 2")

  private val bits: Int = java.lang.Integer.numberOfTrailingZeros(l)

  /** Side length of the square region A. */
  def U: Double = l * delta

  /** Total number of cells, i.e. the alphabet size of the RP-Trie. */
  def numCells: Int = l * l

  /** √2·δ/2 — the max distance between a point and its reference point, used
    * as the slack term of `LB_o`/`LB_t` (Eq. 2–3).
    */
  val halfDiag: Double = math.sqrt(2.0) * delta / 2.0

  private def clamp(c: Int): Int = if (c < 0) 0 else if (c >= l) l - 1 else c

  /** Grid coordinates (cx, cy) of a point, clamped into the region. */
  def cellOf(p: Point): (Int, Int) =
    (clamp(math.floor((p.x - minX) / delta).toInt),
     clamp(math.floor((p.y - minY) / delta).toInt))

  /** Morton interleave: x bit above y bit at every level. */
  def zOf(cx: Int, cy: Int): Int = {
    var z = 0
    var b = 0
    while (b < bits) {
      z |= ((cx >> b) & 1) << (2 * b + 1)
      z |= ((cy >> b) & 1) << (2 * b)
      b += 1
    }
    z
  }

  def zOf(p: Point): Int = { val (cx, cy) = cellOf(p); zOf(cx, cy) }

  /** Inverse of `zOf`. */
  def cellOfZ(z: Int): (Int, Int) = {
    var cx = 0; var cy = 0
    var b = 0
    while (b < bits) {
      cx |= ((z >> (2 * b + 1)) & 1) << b
      cy |= ((z >> (2 * b)) & 1) << b
      b += 1
    }
    (cx, cy)
  }

  /** Reference point (center) of the cell with z-value `z`. */
  def refPoint(z: Int): Point = {
    val (cx, cy) = cellOfZ(z)
    Point(minX + (cx + 0.5) * delta, minY + (cy + 0.5) * delta)
  }

  /** Min distance from `q` to the closed rectangle of cell `z` — the d′(q, g)
    * of Eq. 15, valid for measures without the triangle inequality.
    */
  def cellMinDist(q: Point, z: Int): Double = {
    val (cx, cy) = cellOfZ(z)
    val x0 = minX + cx * delta; val y0 = minY + cy * delta
    val dx = if (q.x < x0) x0 - q.x else if (q.x > x0 + delta) q.x - (x0 + delta) else 0.0
    val dy = if (q.y < y0) y0 - q.y else if (q.y > y0 + delta) q.y - (y0 + delta) else 0.0
    math.sqrt(dx * dx + dy * dy)
  }

  /** Reference trajectory as a z-value sequence with consecutive duplicates
    * collapsed (Definition 4; collapsing is distance-bound-safe for all
    * supported measures — see DESIGN.md).
    */
  def refSeq(pts: Array[Point]): Array[Int] = {
    val out = new scala.collection.mutable.ArrayBuffer[Int](pts.length)
    var i = 0
    while (i < pts.length) {
      val z = zOf(pts(i))
      if (out.isEmpty || out.last != z) out += z
      i += 1
    }
    out.toArray
  }

  /** Distinct z-values of a trajectory (order dropped) — the `Z_i` sets fed
    * to the hitting-set optimization for order-independent measures (§III-C).
    */
  def refSet(pts: Array[Point]): Array[Int] = {
    val seen = new java.util.TreeSet[Integer]()
    var i = 0
    while (i < pts.length) { seen.add(zOf(pts(i))); i += 1 }
    val out = new Array[Int](seen.size)
    val it = seen.iterator(); var j = 0
    while (it.hasNext) { out(j) = it.next(); j += 1 }
    out
  }

  /** Reference trajectory as points (one per entry of `refSeq`). */
  def refPoints(zs: Array[Int]): Array[Point] = zs.map(refPoint)
}

object ZGrid {
  /** Build a grid from a dataset MBR and requested cell side `delta`.
    *
    * The region is the square of side `U = max(width, height)` anchored at
    * the MBR's lower-left corner, padded by one δ so boundary points fall
    * strictly inside. `l` is the smallest power of two with `l·delta ≥ U`,
    * clamped to [2, 4096] (the clamp adjusts δ upward for extreme requests;
    * z-values stay within 24 bits and the succinct encoding switches to its
    * sparse form well before this — see DESIGN.md).
    */
  def fit(mbr: MBR, delta: Double, maxSide: Int = 4096): ZGrid = {
    require(delta > 0, "delta must be positive")
    val u = math.max(math.max(mbr.width, mbr.height), delta) + delta
    var l = 2
    while (l * delta < u && l < maxSide) l <<= 1
    val effDelta = if (l * delta >= u) delta else u / l
    ZGrid(mbr.minX, mbr.minY, l, effDelta)
  }
}
