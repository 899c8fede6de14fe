package repro.spark

import repro.SparkSpec
import repro.core.{EuclideanMetric, TestUtil}

class DistributedGonzalezSpec extends SparkSpec {
  import TestUtil._

  private def toRdd(pts: IndexedSeq[Vec]) =
    spark.sparkContext.parallelize(pts.zipWithIndex.map { case (p, i) => (i.toLong, p) }, 4)

  test("iterative mode: covering, packing, nearest-assignment") {
    val pts  = blobs(500, 2, 3, outliers = 15, seed = 201)
    val rBar = 1.0
    val res  = DistributedGonzalez.run(toRdd(pts), EuclideanMetric, rBar)
    val centers = res.centers
    // packing
    for (i <- centers.indices; j <- i + 1 until centers.length)
      assert(EuclideanMetric.dist(centers(i), centers(j)) > rBar)
    // covering + nearest assignment
    val assigned = res.assigned.collect()
    assert(assigned.length == pts.length)
    assigned.foreach { a =>
      assert(a.dist <= rBar + 1e-9, s"covering violated for ${a.id}")
      val best = centers.map(EuclideanMetric.dist(a.point, _)).min
      assert(math.abs(best - a.dist) < 1e-9, "assignment is not to the nearest center")
      assert(math.abs(EuclideanMetric.dist(a.point, centers(a.center)) - a.dist) < 1e-9)
    }
  }

  test("iterative mode matches the sequential center count on the same data") {
    val pts  = blobs(300, 2, 3, seed = 202)
    val rBar = 0.8
    val seq  = repro.core.Gonzalez.run(pts, EuclideanMetric, rBar)
    val dist = DistributedGonzalez.run(toRdd(pts), EuclideanMetric, rBar)
    // Centers may differ by argmax tie-breaks, but both are r̄-nets of the
    // same space, so the sizes match up to the packing/covering slack.
    assert(math.abs(seq.numCenters - dist.centers.length) <= math.max(2, seq.numCenters / 5),
      s"sequential ${seq.numCenters} vs distributed ${dist.centers.length}")
  }

  test("iterative mode survives many rounds (lineage truncation)") {
    val pts = uniform(400, 2, seed = 203)
    val res = DistributedGonzalez.run(toRdd(pts), EuclideanMetric, rBar = 0.4,
      checkpointEvery = 4)
    assert(res.centers.length > 20)
    assert(res.assigned.count() == 400)
  }

  test("partitioned mode: r̄-covering holds, packing at r̄/2") {
    val pts  = blobs(600, 3, 4, outliers = 10, seed = 204)
    val rBar = 1.2
    val res  = DistributedGonzalez.runPartitioned(toRdd(pts), EuclideanMetric, rBar)
    val centers = res.centers
    for (i <- centers.indices; j <- i + 1 until centers.length)
      assert(EuclideanMetric.dist(centers(i), centers(j)) > rBar / 2)
    res.assigned.collect().foreach { a =>
      assert(a.dist <= rBar + 1e-9, s"covering violated: ${a.dist}")
    }
  }

  test("works under edit distance on an RDD of strings") {
    val rnd  = new scala.util.Random(205)
    val strs = IndexedSeq.fill(120)(
      Iterator.fill(6 + rnd.nextInt(6))(('a' + rnd.nextInt(4)).toChar).mkString)
    val rdd = spark.sparkContext.parallelize(strs.zipWithIndex.map { case (s, i) => (i.toLong, s) }, 3)
    val res = DistributedGonzalez.run(rdd, repro.core.EditDistanceMetric, rBar = 3.0)
    res.assigned.collect().foreach(a => assert(a.dist <= 3.0))
  }
}
