package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DBSCANResultSpec extends AnyFunSuite {

  private val r = DBSCANResult(
    Array(5, 5, 9, -1, 9),
    Array(PointType.Core, PointType.Border, PointType.Core, PointType.Outlier, PointType.Core))

  test("numClusters counts distinct non-noise labels") {
    assert(r.numClusters == 2)
  }

  test("coreIndices / outlierIndices") {
    assert(r.coreIndices == Seq(0, 2, 4))
    assert(r.outlierIndices == Seq(3))
  }

  test("normalized renumbers to 0..k-1, noise stays -1") {
    val n = r.normalized
    assert(n.labels.toSeq == Seq(0, 0, 1, -1, 1))
    assert(n.types.sameElements(r.types))
  }

  test("length mismatch rejected") {
    intercept[IllegalArgumentException] {
      DBSCANResult(Array(1), Array(PointType.Core, PointType.Core))
    }
  }

  test("noise constant is -1") {
    assert(DBSCANResult.Noise == -1)
  }
}
