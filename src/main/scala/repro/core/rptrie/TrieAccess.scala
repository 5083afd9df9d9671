package repro.core.rptrie

import repro.core.{Measure, Point, ZGrid}

/** Read-only traversal interface shared by the pointer RP-Trie and the
  * succinct RP-Trie so `LocalSearch` runs unchanged on either (§III-B).
  *
  * Node handles are dense ints in [0, numNodes); `root` is always handle 0.
  * A node may simultaneously carry trajectory ids (`tids` non-empty — the
  * paper's `$`-terminated leaf for a reference trajectory that is a prefix of
  * another) and children.
  */
trait TrieAccess extends Serializable {
  def grid: ZGrid
  def measure: Measure

  /** Global pivot trajectories (empty for non-metric measures). */
  def pivots: Array[Array[Point]]

  def numNodes: Int
  def root: Int

  def childCount(v: Int): Int

  /** Iterate the children of `v` in ascending z-label order: f(z, child). */
  def foreachChild(v: Int)(f: (Int, Int) => Unit): Unit

  /** Trajectory ids (indices into the partition's trajectory array) whose
    * reference trajectory ends at `v`; empty when `v` is purely internal.
    */
  def tids(v: Int): Array[Int]

  /** Max distance from the trajectories ending at `v` to v's reference
    * trajectory — the `D_max` of Eq. 3. 0 for purely internal nodes.
    */
  def dmax(v: Int): Double

  /** Max over the whole subtree of D(τ, τ*) — bounds the reference-point
    * deviation used by the pivot bound `LB_p` (Eq. 5; see DESIGN.md).
    */
  def maxDev(v: Int): Double

  /** HR[p].min — min distance from reference trajectories in v's subtree to
    * pivot p (§III-B).
    */
  def hrMin(v: Int, p: Int): Double

  /** HR[p].max — max distance from reference trajectories in v's subtree to
    * pivot p.
    */
  def hrMax(v: Int, p: Int): Double

  /** In-memory footprint estimate (index-size metric IS). */
  def estimatedSizeBytes: Long = org.apache.spark.util.SizeEstimator.estimate(this)
}
