package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{EuclideanMetric, PointType, TestUtil}
import repro.eval.ClusterMetrics

/** Sanity suites for the comparison baselines: each must recover three
  * well-separated gaussian blobs (the weakest reasonable bar for any
  * clustering algorithm), plus algorithm-specific behaviours.
  */
class BaselinesSpec extends AnyFunSuite {

  private val pts   = TestUtil.blobs(450, 2, 3, std = 0.3, sep = 25.0, seed = 8)
  private val truth = Array.tabulate(450)(_ % 3)

  private def assertRecovers(labels: Array[Int], who: String, bar: Double = 0.95): Unit = {
    val a = ClusterMetrics.ari(truth, labels)
    assert(a >= bar, s"$who ARI $a < $bar on separated blobs")
  }

  test("DBSCAN++ recovers separated blobs") {
    assertRecovers(DBSCANPlusPlus.run(pts, EuclideanMetric, 1.0, 5).labels, "DBSCAN++")
  }

  test("DBSCAN++ marks far-away points noise") {
    val withOut = pts :+ Array(1e4, 1e4)
    val r = DBSCANPlusPlus.run(withOut, EuclideanMetric, 1.0, 5)
    assert(r.labels.last == -1)
    assert(r.types.last == PointType.Outlier)
  }

  test("DYW_DBSCAN recovers separated blobs") {
    assertRecovers(DYWDBSCAN.run(pts, EuclideanMetric, 1.0, 5, zEstimate = 5).labels, "DYW")
  }

  test("DYW_DBSCAN matches naive DBSCAN structure with outliers present") {
    val data = TestUtil.blobs(300, 2, 3, std = 0.3, sep = 25.0, outliers = 15, seed = 9)
    val want = NaiveDBSCAN.run(data, EuclideanMetric, 1.0, 5)
    val got  = DYWDBSCAN.run(data, EuclideanMetric, 1.0, 5, zEstimate = 20)
    TestUtil.assertSameDBSCAN(data, EuclideanMetric, 1.0, got, want)
  }

  test("GT grid (exact) matches naive DBSCAN in 2D") {
    val data = TestUtil.blobs(300, 2, 3, std = 0.4, sep = 15.0, outliers = 10, seed = 10)
    val want = NaiveDBSCAN.run(data, EuclideanMetric, 1.0, 5)
    val got  = GTGridDBSCAN.run(data, 1.0, 5, rho = 0.0)
    TestUtil.assertSameDBSCAN(data, EuclideanMetric, 1.0, got, want)
  }

  test("GT grid (approx) satisfies the sandwich") {
    val data = TestUtil.blobs(250, 2, 3, std = 0.4, outliers = 10, seed = 11)
    val got  = GTGridDBSCAN.run(data, 1.0, 5, rho = 0.5)
    TestUtil.assertSandwich(data, EuclideanMetric, 1.0, 5, 0.5, got.labels)
  }

  test("GT grid runs in higher dimension too (the slow path)") {
    val data = TestUtil.blobs(200, 5, 2, std = 0.3, sep = 20.0, seed = 12)
    val got  = GTGridDBSCAN.run(data, 1.5, 5)
    assert(got.labels.count(_ >= 0) > 150)
  }

  test("DP-means recovers separated blobs") {
    val lambda = DPMeans.suggestLambda(pts, kInit = 3)
    assertRecovers(DPMeans.run(pts, lambda).labels, "DP-means", bar = 0.9)
  }

  test("DP-means creates more clusters as lambda shrinks") {
    val many = DPMeans.run(pts, lambda = 1.0).centers.length
    val few  = DPMeans.run(pts, lambda = 100.0).centers.length
    assert(many > few, s"$many vs $few")
  }

  test("BICO recovers separated blobs") {
    assertRecovers(BICO.run(pts, k = 3).labels, "BICO", bar = 0.9)
  }

  test("BICO coreset stays under the cap") {
    val out = BICO.run(pts, k = 3, coresetCap = 50)
    assert(out.coresetSize <= 50)
  }

  test("Density-peak recovers separated blobs") {
    assertRecovers(DensityPeak.run(pts, EuclideanMetric, dc = 1.0, k = 3, noiseRho = 0),
      "Density-peak", bar = 0.9)
  }

  test("Mean shift recovers separated blobs") {
    assertRecovers(MeanShift.run(pts, bandwidth = 2.0), "Meanshift", bar = 0.9)
  }

  test("DBStream recovers separated blobs") {
    assertRecovers(DBStream.run(pts, r = 1.0), "DBStream", bar = 0.8)
  }

  test("D-Stream recovers separated 2D blobs") {
    assertRecovers(DStream.run(pts, cellSide = 1.0), "D-Stream", bar = 0.8)
  }

  test("D-Stream collapses in high dimension (curse of dimensionality)") {
    val hd = TestUtil.blobs(400, 32, 3, std = 0.5, sep = 10.0, seed = 13)
    val labels = DStream.run(hd, cellSide = 2.0 / math.sqrt(32.0))
    val a = ClusterMetrics.ari(Array.tabulate(400)(_ % 3), labels)
    assert(a < 0.5, s"D-Stream should degrade in high-d, got ARI $a")
  }

  test("evoStream recovers separated blobs") {
    assertRecovers(EvoStream.run(pts, k = 3, radius = 1.0), "evoStream", bar = 0.8)
  }
}
