package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ClusterMetricsSpec extends AnyFunSuite {
  import ClusterMetrics._

  test("ARI of identical labelings is 1") {
    val a = Array(0, 0, 1, 1, 2, 2)
    assert(math.abs(ari(a, a) - 1.0) < 1e-12)
  }

  test("ARI invariant to relabeling") {
    val a = Array(0, 0, 1, 1, 2, 2)
    val b = Array(5, 5, 9, 9, 7, 7)
    assert(math.abs(ari(a, b) - 1.0) < 1e-12)
  }

  test("ARI known value (sklearn example)") {
    // sklearn: adjusted_rand_score([0,0,1,1],[0,0,1,2]) == 0.5714285714...
    val v = ari(Array(0, 0, 1, 1), Array(0, 0, 1, 2))
    assert(math.abs(v - 0.5714285714285714) < 1e-9)
  }

  test("ARI of a random labeling is near 0 in expectation") {
    val rnd = new Random(1)
    val truth = Array.tabulate(2000)(_ % 4)
    val vals = (0 until 10).map { _ =>
      ari(truth, Array.fill(2000)(rnd.nextInt(4)))
    }
    assert(math.abs(vals.sum / vals.length) < 0.02, s"mean ARI ${vals.sum / vals.length}")
  }

  test("ARI penalizes the all-in-one-cluster labeling") {
    val truth = Array.tabulate(100)(_ % 4)
    val allOne = Array.fill(100)(0)
    assert(ari(truth, allOne) < 0.01)
  }

  test("ARI is symmetric") {
    val rnd = new Random(2)
    for (_ <- 0 until 20) {
      val a = Array.fill(50)(rnd.nextInt(4))
      val b = Array.fill(50)(rnd.nextInt(3))
      assert(math.abs(ari(a, b) - ari(b, a)) < 1e-12)
    }
  }

  test("MI matches hand computation") {
    // Two clusters each side, perfectly aligned, equal sizes: MI = ln 2.
    val a = Array(0, 0, 1, 1)
    assert(math.abs(mutualInformation(a, a) - math.log(2)) < 1e-12)
  }

  test("AMI of identical labelings is 1") {
    val a = Array(0, 0, 1, 1, 2, 2, 2)
    assert(math.abs(ami(a, a) - 1.0) < 1e-9)
  }

  test("AMI invariant to relabeling") {
    val a = Array(0, 1, 2, 0, 1, 2, 0)
    val b = a.map(x => (x + 5) * 3)
    assert(math.abs(ami(a, b) - 1.0) < 1e-9)
  }

  test("AMI known value (hand-computed)") {
    // For [0,0,1,1] vs [0,0,1,2]: MI = ln2, EMI = (2/3)ln2 (hypergeometric:
    // (2,2)-pairs contribute 2·(1/6)(1/2)ln2, (2,1)-pairs 4·(1/2)(1/4)ln2),
    // mean entropy = (5/4)ln2 ⇒ AMI = (1/3)/(7/12) = 4/7.
    val v = ami(Array(0, 0, 1, 1), Array(0, 0, 1, 2))
    assert(math.abs(v - 4.0 / 7.0) < 1e-9, s"got $v")
  }

  test("AMI of a random labeling is near 0 in expectation") {
    val rnd = new Random(3)
    val truth = Array.tabulate(1000)(_ % 5)
    val vals = (0 until 8).map(_ => ami(truth, Array.fill(1000)(rnd.nextInt(5))))
    assert(math.abs(vals.sum / vals.length) < 0.02)
  }

  test("AMI ≤ 1 always; ARI ≤ 1 always") {
    val rnd = new Random(4)
    for (_ <- 0 until 30) {
      val n = 20 + rnd.nextInt(100)
      val a = Array.fill(n)(rnd.nextInt(5))
      val b = Array.fill(n)(rnd.nextInt(5))
      assert(ami(a, b) <= 1.0 + 1e-9)
      assert(ari(a, b) <= 1.0 + 1e-9)
    }
  }

  test("noise label -1 is one cluster (documented convention)") {
    val truth = Array(0, 0, 1, 1, -1, -1)
    val pred  = Array(7, 7, 8, 8, -1, -1)
    assert(math.abs(ari(truth, pred) - 1.0) < 1e-12)
    assert(math.abs(ami(truth, pred) - 1.0) < 1e-9)
  }

  test("length mismatch rejected") {
    intercept[IllegalArgumentException](ari(Array(1), Array(1, 2)))
    intercept[IllegalArgumentException](ami(Array.empty[Int], Array.empty[Int]))
  }
}
