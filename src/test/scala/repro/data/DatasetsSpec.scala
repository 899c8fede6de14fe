package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.EuclideanMetric

class DatasetsSpec extends AnyFunSuite {

  test("moons: size, labels, outlier fraction") {
    val ds = Datasets.moons(1000)
    assert(ds.n == 1000)
    assert(ds.points.forall(_.length == 2))
    assert(ds.labels.count(_ < 0) == 10)
    assert(ds.labels.filter(_ >= 0).distinct.sorted.toSeq == Seq(0, 1))
  }

  test("moons: deterministic in the seed") {
    val a = Datasets.moons(200, seed = 5)
    val b = Datasets.moons(200, seed = 5)
    val c = Datasets.moons(200, seed = 6)
    assert(a.points.zip(b.points).forall { case (x, y) => x.sameElements(y) })
    assert(!a.points.zip(c.points).forall { case (x, y) => x.sameElements(y) })
  }

  test("cluto: five shapes, a ring with a blob inside it") {
    val ds = Datasets.cluto(2000)
    assert(ds.labels.filter(_ >= 0).distinct.sorted.toSeq == Seq(0, 1, 2, 3, 4))
    // ring points (label 3) should be ~3 away from the ring center (10, 6)
    val ring = ds.points.indices.filter(ds.labels(_) == 3).map(ds.points)
    ring.foreach { p =>
      val r = EuclideanMetric.dist(p, Array(10.0, 6.0))
      assert(r > 2.0 && r < 4.0, s"ring radius $r")
    }
    // inner blob (label 4) sits strictly inside the ring
    val inner = ds.points.indices.filter(ds.labels(_) == 4).map(ds.points)
    inner.foreach { p =>
      assert(EuclideanMetric.dist(p, Array(10.0, 6.0)) < 2.5)
    }
  }

  test("blobs: dimensions and cluster spread") {
    val ds = Datasets.blobs("B", 500, d = 16, k = 3)
    assert(ds.n == 500)
    assert(ds.points.forall(_.length == 16))
    assert(ds.labels.filter(_ >= 0).distinct.length == 3)
  }

  test("manifold: concentric ring+blob pairs in separated grid cells") {
    val ds = Datasets.manifold("M", 600, d = 32, dIntrinsic = 4, k = 4)
    val byLabel = ds.points.indices.groupBy(ds.labels)
    // blobs of different cells (labels 1 and 3) are compact and far apart
    val b0 = byLabel(1).take(20).map(ds.points)
    val b1 = byLabel(3).take(20).map(ds.points)
    val within = for (a <- b0; b <- b0 if a ne b) yield EuclideanMetric.dist(a, b)
    val across = for (a <- b0; b <- b1) yield EuclideanMetric.dist(a, b)
    assert(within.max < across.min, "cells must be separated")
    // the ring (label 0) surrounds its blob (label 1): ring-to-blob distance
    // is bounded away from zero but far below the cross-cell distance
    val r0 = byLabel(0).take(20).map(ds.points)
    val ringToBlob = for (a <- r0; b <- b0) yield EuclideanMetric.dist(a, b)
    assert(ringToBlob.min > 6.0, "ring must not touch its inner blob")
    assert(ringToBlob.max < across.min, "ring and blob share a cell")
  }

  test("manifoldNoisy: 10x duplication plus 1% noise") {
    val ds = Datasets.manifoldNoisy("MN", 100, d = 16, dIntrinsic = 4, k = 2)
    assert(ds.n == 100 * 10 + 10)
    assert(ds.labels.count(_ < 0) == 10)
  }

  test("text: members stay close to the template, outliers far") {
    val ds = Datasets.text("T", 300, k = 3, templateLen = 30, maxEdits = 3)
    val m  = ds.metric
    val byLabel = ds.points.indices.groupBy(ds.labels)
    val inA = byLabel(0).take(10).map(ds.points)
    // two members of the same cluster differ by at most 2×maxEdits
    for (a <- inA; b <- inA) assert(m.dist(a, b) <= 6.0)
    val out = byLabel.getOrElse(-1, Seq.empty).take(5).map(ds.points)
    for (o <- out; a <- inA.take(3)) assert(m.dist(o, a) > 6.0)
  }

  test("spotifyLike: 21 dims, drift shifts the mixture") {
    val ds = Datasets.spotifyLike(4000)
    assert(ds.points.forall(_.length == 21))
    val early = ds.labels.take(400).filter(_ >= 0)
    val late  = ds.labels.takeRight(400).filter(_ >= 0)
    assert(early.sum.toDouble / early.length < late.sum.toDouble / late.length,
      "later stream positions must favour later clusters")
  }

  test("suggestEps: positive, scales with the data") {
    val tight = Datasets.blobs("t", 400, d = 4, k = 2, std = 0.1, seed = 1)
    val loose = Datasets.blobs("l", 400, d = 4, k = 2, std = 2.0, seed = 1)
    val eT = Datasets.suggestEps(tight, 10)
    val eL = Datasets.suggestEps(loose, 10)
    assert(eT > 0 && eL > 0)
    assert(eL > eT, s"looser blobs must suggest larger eps ($eL vs $eT)")
  }

  test("suggestEps works for text datasets") {
    val ds = Datasets.text("T2", 200, k = 3)
    val e  = Datasets.suggestEps(ds, 10)
    assert(e > 0 && e < 40)
  }
}
