package repro.core

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck property suites for the metric substrate and the net
  * invariants — runs under sbt's native ScalaCheck integration.
  */
object MetricProps extends Properties("Metric") {
  private val vec: Gen[Array[Double]] =
    Gen.choose(1, 6).flatMap(d => Gen.containerOfN[Array, Double](d, Gen.choose(-50.0, 50.0)))
  private val vecPair = for {
    d <- Gen.choose(1, 6)
    a <- Gen.containerOfN[Array, Double](d, Gen.choose(-50.0, 50.0))
    b <- Gen.containerOfN[Array, Double](d, Gen.choose(-50.0, 50.0))
  } yield (a, b)
  private val vecTriple = for {
    d <- Gen.choose(1, 6)
    a <- Gen.containerOfN[Array, Double](d, Gen.choose(-50.0, 50.0))
    b <- Gen.containerOfN[Array, Double](d, Gen.choose(-50.0, 50.0))
    c <- Gen.containerOfN[Array, Double](d, Gen.choose(-50.0, 50.0))
  } yield (a, b, c)

  property("euclidean nonneg + identity") = Prop.forAll(vec) { a =>
    EuclideanMetric.dist(a, a) == 0.0 && EuclideanMetric.dist(a, a.map(_ + 1)) > 0
  }
  property("euclidean symmetry") = Prop.forAll(vecPair) { case (a, b) =>
    EuclideanMetric.dist(a, b) == EuclideanMetric.dist(b, a)
  }
  property("euclidean triangle inequality") = Prop.forAll(vecTriple) { case (a, b, c) =>
    EuclideanMetric.dist(a, c) <= EuclideanMetric.dist(a, b) + EuclideanMetric.dist(b, c) + 1e-9
  }

  private val str = Gen.choose(0, 12).flatMap(n => Gen.stringOfN(n, Gen.oneOf('a', 'b', 'c')))
  property("edit distance symmetry") = Prop.forAll(str, str) { (a, b) =>
    EditDistanceMetric.dist(a, b) == EditDistanceMetric.dist(b, a)
  }
  property("edit distance triangle inequality") = Prop.forAll(str, str, str) { (a, b, c) =>
    EditDistanceMetric.dist(a, c) <= EditDistanceMetric.dist(a, b) + EditDistanceMetric.dist(b, c)
  }
  property("edit distance bounds") = Prop.forAll(str, str) { (a, b) =>
    val d = EditDistanceMetric.dist(a, b)
    d <= math.max(a.length, b.length) && d >= math.abs(a.length - b.length)
  }
}

object GonzalezProps extends Properties("Gonzalez") {
  private val instance = for {
    n    <- Gen.choose(20, 150)
    d    <- Gen.choose(1, 3)
    seed <- Gen.choose(0L, 10000L)
    rBar <- Gen.choose(0.2, 5.0)
  } yield {
    val rnd = new scala.util.Random(seed)
    (IndexedSeq.fill(n)(Array.fill(d)(rnd.nextDouble() * 20)), rBar)
  }

  property("covering radius ≤ rBar") = Prop.forAll(instance) { case (pts, rBar) =>
    val g = Gonzalez.run(pts, EuclideanMetric, rBar)
    g.coveringRadius <= rBar + 1e-9
  }
  property("centers are rBar-separated") = Prop.forAll(instance) { case (pts, rBar) =>
    val g  = Gonzalez.run(pts, EuclideanMetric, rBar)
    val cs = g.centerIdx.map(pts)
    cs.indices.forall(i => (i + 1 until cs.length).forall(j =>
      EuclideanMetric.dist(cs(i), cs(j)) > rBar))
  }
  property("cover sets partition the input") = Prop.forAll(instance) { case (pts, rBar) =>
    val g = Gonzalez.run(pts, EuclideanMetric, rBar)
    g.coverSets.map(_.length).sum == pts.length &&
      g.coverSets.flatten.toSet == pts.indices.toSet
  }
}

object UnionFindProps extends Properties("UnionFind") {
  private val ops = for {
    n   <- Gen.choose(2, 50)
    ops <- Gen.listOf(Gen.zip(Gen.choose(0, n - 1), Gen.choose(0, n - 1)))
  } yield (n, ops)

  property("connectivity is an equivalence relation") = Prop.forAll(ops) { case (n, pairs) =>
    val uf = new UnionFind(n)
    pairs.foreach { case (a, b) => uf.union(a, b) }
    val ids = uf.componentIds
    (0 until n).forall { i =>
      uf.connected(i, i) && (0 until n).forall(j => uf.connected(i, j) == (ids(i) == ids(j)))
    }
  }
}
