package repro.baselines

import repro.core.{DBSCANResult, Metric, PointType, UnionFind}
import scala.util.Random

/** The randomized k-center-with-outliers DBSCAN of Ding, Yang & Wang
  * (IJCAI'21) — the paper's `DYW_DBSCAN` baseline (Section 3.3 discusses it).
  *
  * Pre-processing: the randomized greedy k-center-with-outliers of Ding, Yu &
  * Wang (ESA'19) — each round picks the next center uniformly from the
  * (1+η)·z̃ points farthest from the current centers — run until at most z̃
  * points remain farther than r̄ = ε/2 from every center (the manually-set
  * termination the paper criticizes: it needs an outlier-count estimate z̃).
  *
  * Clustering: original DBSCAN where each range query is restricted to the
  * balls within 2r̄ + ε of the query's ball (their heuristic improvement to
  * Step (1)); merging is per point-pair, i.e. worst-case quadratic.
  */
object DYWDBSCAN {

  def run[T](points: IndexedSeq[T], metric: Metric[T], eps: Double, minPts: Int,
             zEstimate: Int, eta: Double = 1.0, seed: Long = 3): DBSCANResult = {
    val n    = points.length
    val rnd  = new Random(seed)
    val rBar = eps / 2.0

    // --- randomized k-center with outliers ---------------------------------
    val dists   = Array.fill(n)(Double.PositiveInfinity)
    val assign  = new Array[Int](n)
    val centers = scala.collection.mutable.ArrayBuffer.empty[Int]
    def addCenter(c: Int): Unit = {
      val e = centers.length
      centers += c
      var i = 0
      while (i < n) {
        val d = metric.dist(points(i), points(c))
        if (d < dists(i)) { dists(i) = d; assign(i) = e }
        i += 1
      }
    }
    addCenter(rnd.nextInt(n))
    val batch = math.min(n, math.max(1, math.ceil((1 + eta) * math.max(1, zEstimate)).toInt))
    // top-`batch` selection by distance via a bounded min-heap of indices —
    // a full sort per iteration would dominate the runtime.
    def farthestBatch(): Array[Int] = {
      val heap = new java.util.PriorityQueue[Int](batch, (a: Int, b: Int) =>
        java.lang.Double.compare(dists(a), dists(b)))
      var i = 0
      while (i < n) {
        if (heap.size < batch) heap.add(i)
        else if (dists(i) > dists(heap.peek())) { heap.poll(); heap.add(i) }
        i += 1
      }
      heap.toArray(new Array[Integer](0)).map(_.intValue())
    }
    var uncovered = dists.count(_ > rBar)
    var guard     = 0
    while (uncovered > zEstimate && guard < n) {
      // sample uniformly from the `batch` farthest points
      val far = farthestBatch()
      addCenter(far(rnd.nextInt(far.length)))
      uncovered = dists.count(_ > rBar)
      guard += 1
    }
    val k = centers.length

    // --- neighbor balls + restricted brute-force DBSCAN ---------------------
    val cpts  = centers.toIndexedSeq.map(points)
    val ballN = Array.tabulate(k) { i =>
      (0 until k).filter(j => metric.dist(cpts(i), cpts(j)) <= 2 * rBar + eps).toArray
    }
    val members = Array.fill(k)(scala.collection.mutable.ArrayBuffer.empty[Int])
    var i = 0
    while (i < n) { members(assign(i)) += i; i += 1 }

    def rangeQuery(p: Int): IndexedSeq[Int] = {
      val pp  = points(p)
      val out = scala.collection.mutable.ArrayBuffer.empty[Int]
      if (dists(p) > rBar) {
        // p is one of the ≤ z̃ uncovered points: no ball-locality guarantee,
        // fall back to a full scan (this is why z̃ under-estimates hurt [17]).
        var q = 0
        while (q < n) {
          if (metric.dist(pp, points(q)) <= eps) out += q
          q += 1
        }
      } else {
        // Covered p: covered q within ε implies dis(c_p, c_q) ≤ 2r̄ + ε, so
        // scanning the neighbor balls suffices; uncovered q must still be
        // checked individually.
        ballN(assign(p)).foreach { b =>
          members(b).foreach { q =>
            if (dists(q) <= rBar && metric.dist(pp, points(q)) <= eps) out += q
          }
        }
        var q = 0
        while (q < n) {
          if (dists(q) > rBar && metric.dist(pp, points(q)) <= eps) out += q
          q += 1
        }
      }
      out.toIndexedSeq
    }

    val isCore = new Array[Boolean](n)
    val neigh  = new Array[IndexedSeq[Int]](n)
    i = 0
    while (i < n) {
      neigh(i)  = rangeQuery(i)
      isCore(i) = neigh(i).length >= minPts
      i += 1
    }
    val uf = new UnionFind(n)
    i = 0
    while (i < n) {
      if (isCore(i)) neigh(i).foreach(q => if (isCore(q)) uf.union(i, q))
      i += 1
    }
    val labels = Array.fill(n)(DBSCANResult.Noise)
    val types  = Array.fill(n)(PointType.Outlier)
    val idMap  = scala.collection.mutable.HashMap.empty[Int, Int]
    i = 0
    while (i < n) {
      if (isCore(i)) {
        labels(i) = idMap.getOrElseUpdate(uf.find(i), idMap.size)
        types(i)  = PointType.Core
      }
      i += 1
    }
    i = 0
    while (i < n) {
      if (!isCore(i)) {
        val c = neigh(i).find(isCore)
        c.foreach { q =>
          labels(i) = labels(q)
          types(i)  = PointType.Border
        }
      }
      i += 1
    }
    DBSCANResult(labels, types)
  }
}
