package repro.core

/** A similarity measure pluggable into REPOSE and the baselines (§VI).
  *
  * `isMetric` decides whether pivot-based pruning (`LB_p`) applies;
  * `orderIndependent` decides whether the optimized (re-arranged) trie may be
  * used — only Hausdorff qualifies (§III-C).
  */
sealed trait Measure extends Serializable {
  def name: String
  def isMetric: Boolean
  def orderIndependent: Boolean
  /** Exact trajectory distance under this measure. */
  def dist(a: Array[Point], b: Array[Point]): Double
  final def dist(a: Trajectory, b: Trajectory): Double = dist(a.points, b.points)
}

case object Hausdorff extends Measure {
  val name = "Hausdorff"; val isMetric = true; val orderIndependent = true
  def dist(a: Array[Point], b: Array[Point]): Double = Distances.hausdorff(a, b)
}

case object Frechet extends Measure {
  val name = "Frechet"; val isMetric = true; val orderIndependent = false
  def dist(a: Array[Point], b: Array[Point]): Double = Distances.frechet(a, b)
}

case object DTW extends Measure {
  val name = "DTW"; val isMetric = false; val orderIndependent = false
  def dist(a: Array[Point], b: Array[Point]): Double = Distances.dtw(a, b)
}

/** ERP with a fixed gap point `g` (a metric for any fixed g). */
final case class ERP(g: Point) extends Measure {
  val name = "ERP"; val isMetric = true; val orderIndependent = false
  def dist(a: Array[Point], b: Array[Point]): Double = Distances.erp(a, b, g)
}

/** LCSS-derived distance 1 − LCSS/min(m,n) with matching threshold `eps`. */
final case class LCSS(eps: Double) extends Measure {
  val name = "LCSS"; val isMetric = false; val orderIndependent = false
  def dist(a: Array[Point], b: Array[Point]): Double = Distances.lcssDist(a, b, eps)
}

/** EDR with matching threshold `eps` (not a metric). */
final case class EDR(eps: Double) extends Measure {
  val name = "EDR"; val isMetric = false; val orderIndependent = false
  def dist(a: Array[Point], b: Array[Point]): Double = Distances.edr(a, b, eps)
}
