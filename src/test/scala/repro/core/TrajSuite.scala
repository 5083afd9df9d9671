package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Point / Trajectory / MBR primitives. */
class TrajSuite extends AnyFunSuite {

  test("point distance is Euclidean") {
    assert(Point(0, 0).dist(Point(3, 4)) == 5.0)
    assert(Point(1, 1).dist(Point(1, 1)) == 0.0)
  }

  test("MBR of points covers all and is tight") {
    val m = MBR(Array(Point(1, 5), Point(3, 2), Point(2, 7)))
    assert(m == MBR(1, 2, 3, 7))
  }

  test("MBR of empty point set is rejected") {
    intercept[IllegalArgumentException](MBR(Array.empty[Point]))
  }

  test("MBR union covers both") {
    val a = MBR(0, 0, 1, 1); val b = MBR(2, 2, 3, 3)
    assert(a.union(b) == MBR(0, 0, 3, 3))
  }

  test("MBR minDist to inner point is zero") {
    assert(MBR(0, 0, 2, 2).minDist(Point(1, 1)) == 0.0)
  }

  test("MBR minDist to outer point is the rectangle distance") {
    assert(MBR(0, 0, 2, 2).minDist(Point(5, 2)) == 3.0)
    assert(MBR(0, 0, 2, 2).minDist(Point(5, 6)) == 5.0)
  }

  test("MBR-MBR minDist is zero when overlapping") {
    assert(MBR(0, 0, 2, 2).minDist(MBR(1, 1, 3, 3)) == 0.0)
  }

  test("MBR-MBR minDist for separated rectangles") {
    assert(MBR(0, 0, 1, 1).minDist(MBR(4, 1, 5, 2)) == 3.0)
    assert(MBR(0, 0, 1, 1).minDist(MBR(4, 5, 6, 7)) == 5.0)
  }

  test("MBR contains") {
    assert(MBR(0, 0, 2, 2).contains(Point(2, 2)))
    assert(!MBR(0, 0, 2, 2).contains(Point(2.1, 2)))
  }

  test("trajectory mbr and length") {
    val t = Trajectory(1, Array(Point(0, 0), Point(2, 3)))
    assert(t.length == 2)
    assert(t.mbr == MBR(0, 0, 2, 3))
  }

  test("trajectory equality is by id and points") {
    val t1 = Trajectory(1, Array(Point(0, 0)))
    val t2 = Trajectory(1, Array(Point(0, 0)))
    val t3 = Trajectory(2, Array(Point(0, 0)))
    assert(t1 == t2)
    assert(t1 != t3)
  }

  test("measure flags: metricity and order independence") {
    assert(Hausdorff.isMetric && Hausdorff.orderIndependent)
    assert(Frechet.isMetric && !Frechet.orderIndependent)
    assert(!DTW.isMetric)
    assert(ERP(Point(0, 0)).isMetric)
    assert(!LCSS(1.0).isMetric)
    assert(!EDR(1.0).isMetric)
  }
}
