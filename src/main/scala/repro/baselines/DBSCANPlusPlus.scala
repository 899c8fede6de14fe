package repro.baselines

import repro.core.{DBSCANResult, Metric, PointType, UnionFind}
import scala.util.Random

/** DBSCAN++ (Jang & Jiang, ICML'19): compute core points only among a
  * uniform sample of m = ⌈ratio·n⌉ points (neighborhoods are still counted
  * against the *full* dataset), cluster the sampled core points exactly as
  * DBSCAN would, and attach every remaining point to its nearest sampled
  * core point within ε.
  *
  * The paper's experiments use ratio = 0.3 ("as suggested in their paper").
  */
object DBSCANPlusPlus {

  def run[T](points: IndexedSeq[T], metric: Metric[T], eps: Double, minPts: Int,
             ratio: Double = 0.3, seed: Long = 1): DBSCANResult = {
    val n   = points.length
    val rnd = new Random(seed)
    val m   = math.max(1, math.ceil(ratio * n).toInt)
    val sample = rnd.shuffle((0 until n).toVector).take(m).toArray

    // Core test for sampled points against all of X.
    val sampledCore = sample.filter { s =>
      var cnt = 0
      var j   = 0
      while (j < n && cnt < minPts) {
        if (metric.dist(points(s), points(j)) <= eps) cnt += 1
        j += 1
      }
      cnt >= minPts
    }

    // Link sampled core points within ε (the DBSCAN merge graph on the sample).
    val uf = new UnionFind(sampledCore.length)
    var i = 0
    while (i < sampledCore.length) {
      var j = i + 1
      while (j < sampledCore.length) {
        if (!uf.connected(i, j) &&
            metric.dist(points(sampledCore(i)), points(sampledCore(j))) <= eps) uf.union(i, j)
        j += 1
      }
      i += 1
    }
    val coreLabel = uf.componentIds

    val labels = Array.fill(n)(DBSCANResult.Noise)
    val types  = Array.fill(n)(PointType.Outlier)
    i = 0
    while (i < sampledCore.length) {
      labels(sampledCore(i)) = coreLabel(i)
      types(sampledCore(i))  = PointType.Core
      i += 1
    }
    var p = 0
    while (p < n) {
      if (types(p) != PointType.Core) {
        var best  = Double.PositiveInfinity
        var bestI = -1
        var s     = 0
        while (s < sampledCore.length) {
          val d = metric.dist(points(p), points(sampledCore(s)))
          if (d < best) { best = d; bestI = s }
          s += 1
        }
        if (bestI >= 0 && best <= eps) {
          labels(p) = coreLabel(bestI)
          types(p)  = PointType.Border
        }
      }
      p += 1
    }
    DBSCANResult(labels, types)
  }
}
