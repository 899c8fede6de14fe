package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MetricSpec extends AnyFunSuite {

  test("euclidean: zero iff identical") {
    val a = Array(1.0, 2.0, 3.0)
    assert(EuclideanMetric.dist(a, a) == 0.0)
    assert(EuclideanMetric.dist(a, Array(1.0, 2.0, 3.1)) > 0)
  }

  test("euclidean: known value") {
    assert(math.abs(EuclideanMetric.dist(Array(0.0, 0.0), Array(3.0, 4.0)) - 5.0) < 1e-12)
  }

  test("euclidean: symmetry on random vectors") {
    val rnd = new Random(1)
    for (_ <- 0 until 200) {
      val d = 1 + rnd.nextInt(16)
      val a = Array.fill(d)(rnd.nextGaussian() * 10)
      val b = Array.fill(d)(rnd.nextGaussian() * 10)
      assert(EuclideanMetric.dist(a, b) == EuclideanMetric.dist(b, a))
    }
  }

  test("euclidean: triangle inequality on random triples") {
    val rnd = new Random(2)
    for (_ <- 0 until 500) {
      val d = 1 + rnd.nextInt(8)
      val Seq(a, b, c) = Seq.fill(3)(Array.fill(d)(rnd.nextGaussian() * 5))
      assert(EuclideanMetric.dist(a, c) <=
        EuclideanMetric.dist(a, b) + EuclideanMetric.dist(b, c) + 1e-9)
    }
  }

  test("euclidean: dimension mismatch rejected") {
    intercept[IllegalArgumentException] {
      EuclideanMetric.dist(Array(1.0), Array(1.0, 2.0))
    }
  }

  test("edit distance: known values") {
    assert(EditDistanceMetric.dist("kitten", "sitting") == 3.0)
    assert(EditDistanceMetric.dist("flaw", "lawn") == 2.0)
    assert(EditDistanceMetric.dist("", "abc") == 3.0)
    assert(EditDistanceMetric.dist("abc", "") == 3.0)
    assert(EditDistanceMetric.dist("abc", "abc") == 0.0)
    assert(EditDistanceMetric.dist("a", "b") == 1.0)
  }

  test("edit distance: symmetry on random strings") {
    val rnd = new Random(3)
    def s(): String = Iterator.fill(rnd.nextInt(12))(('a' + rnd.nextInt(4)).toChar).mkString
    for (_ <- 0 until 300) {
      val (a, b) = (s(), s())
      assert(EditDistanceMetric.dist(a, b) == EditDistanceMetric.dist(b, a))
    }
  }

  test("edit distance: triangle inequality on random triples") {
    val rnd = new Random(4)
    def s(): String = Iterator.fill(rnd.nextInt(10))(('a' + rnd.nextInt(3)).toChar).mkString
    for (_ <- 0 until 500) {
      val (a, b, c) = (s(), s(), s())
      assert(EditDistanceMetric.dist(a, c) <=
        EditDistanceMetric.dist(a, b) + EditDistanceMetric.dist(b, c))
    }
  }

  test("edit distance: bounded by max length, at least length difference") {
    val rnd = new Random(5)
    def s(): String = Iterator.fill(rnd.nextInt(15))(('a' + rnd.nextInt(5)).toChar).mkString
    for (_ <- 0 until 300) {
      val (a, b) = (s(), s())
      val d = EditDistanceMetric.dist(a, b)
      assert(d <= math.max(a.length, b.length))
      assert(d >= math.abs(a.length - b.length))
    }
  }
}
