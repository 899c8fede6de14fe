package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{EuclideanMetric, PointType, TestUtil}

class NaiveDBSCANSpec extends AnyFunSuite {

  test("textbook example: two dense groups, one border, one outlier") {
    // group A around (0,0), group B around (10,10), border next to A, far
    // outlier. minPts = 5: the border point at (1.05, 0) sees only itself,
    // (0.1,0) and (0.1,0.1) within ε=1 (3 < 5) but lies within ε of core
    // (0.1,0), so it is a border point of A's cluster.
    val pts = IndexedSeq(
      Array(0.0, 0.0), Array(0.1, 0.0), Array(0.0, 0.1), Array(0.1, 0.1), Array(0.05, 0.05), // A
      Array(1.05, 0.0),                                                       // border of A
      Array(10.0, 10.0), Array(10.1, 10.0), Array(10.0, 10.1), Array(10.1, 10.1), Array(10.05, 10.05), // B
      Array(50.0, 50.0)                                                       // outlier
    )
    val r = NaiveDBSCAN.run(pts, EuclideanMetric, eps = 1.0, minPts = 5)
    assert(r.numClusters == 2)
    assert((0 to 4).forall(r.types(_) == PointType.Core))
    assert(r.types(5) == PointType.Border)
    assert(r.labels(5) == r.labels(0))
    assert((6 to 10).forall(r.types(_) == PointType.Core))
    assert(r.labels(6) != r.labels(0))
    assert(r.types(11) == PointType.Outlier && r.labels(11) == -1)
  }

  test("core definition counts the point itself") {
    // 3 coincident points, minPts = 3: each has |B| = 3 ⇒ all core.
    val pts = IndexedSeq.fill(3)(Array(1.0, 1.0))
    val r = NaiveDBSCAN.run(pts, EuclideanMetric, 0.5, 3)
    assert(r.types.forall(_ == PointType.Core))
    // minPts = 4 ⇒ nobody is core, all outliers
    val r2 = NaiveDBSCAN.run(pts, EuclideanMetric, 0.5, 4)
    assert(r2.types.forall(_ == PointType.Outlier))
  }

  test("chain of core points forms one cluster (density-reachability)") {
    // a line of points, each within eps of the next, all core via minPts=2
    val pts = IndexedSeq.tabulate(30)(i => Array(i * 0.9, 0.0))
    val r = NaiveDBSCAN.run(pts, EuclideanMetric, 1.0, 2)
    assert(r.numClusters == 1)
    assert(r.types.forall(_ == PointType.Core))
  }

  test("separated blobs give one cluster each") {
    val pts = TestUtil.blobs(300, 2, 3, std = 0.3, sep = 30.0, seed = 3)
    val r = NaiveDBSCAN.run(pts, EuclideanMetric, 1.0, 5)
    assert(r.numClusters == 3)
  }
}
