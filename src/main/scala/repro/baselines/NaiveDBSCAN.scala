package repro.baselines

import repro.core.{DBSCANResult, Metric, PointType}
import scala.collection.mutable

/** The original DBSCAN of Ester et al. [23], transcribed directly: brute-force
  * ε-range queries (Θ(n²) distance evaluations) + BFS cluster expansion.
  *
  * Serves two roles: the `DBSCAN` baseline of Section 5.2/Table 3, and the
  * ground-truth oracle the fast algorithms are verified against in tests.
  */
object NaiveDBSCAN {

  def run[T](points: IndexedSeq[T], metric: Metric[T], eps: Double, minPts: Int): DBSCANResult = {
    val n = points.length
    // All ε-neighborhoods up front (the quadratic part).
    val neigh = Array.fill(n)(mutable.ArrayBuffer.empty[Int])
    var i = 0
    while (i < n) {
      neigh(i) += i // |B(p, ε) ∩ X| includes p itself
      var j = i + 1
      while (j < n) {
        if (metric.dist(points(i), points(j)) <= eps) { neigh(i) += j; neigh(j) += i }
        j += 1
      }
      i += 1
    }
    val isCore = Array.tabulate(n)(neigh(_).length >= minPts)
    val labels = Array.fill(n)(DBSCANResult.Noise)
    val types  = Array.fill(n)(PointType.Outlier)

    var nextCluster = 0
    i = 0
    while (i < n) {
      if (isCore(i) && labels(i) == DBSCANResult.Noise) {
        val cid = nextCluster; nextCluster += 1
        val queue = mutable.Queue(i)
        labels(i) = cid
        types(i)  = PointType.Core
        while (queue.nonEmpty) {
          val p = queue.dequeue()
          neigh(p).foreach { q =>
            if (isCore(q)) {
              if (labels(q) == DBSCANResult.Noise) {
                labels(q) = cid
                types(q)  = PointType.Core
                queue += q
              }
            } else if (labels(q) == DBSCANResult.Noise) {
              labels(q) = cid // border: density-reachable, not expanded
              types(q)  = PointType.Border
            }
          }
        }
      }
      i += 1
    }
    DBSCANResult(labels, types)
  }
}
