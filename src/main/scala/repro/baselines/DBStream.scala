package repro.baselines

import scala.collection.mutable

/** DBStream (Hahsler & Bolaños, TKDE'16) — micro-clusters with shared-density
  * reclustering; Table 4 baseline.
  *
  * Online phase: each arriving point updates (weight + center, moving toward
  * the point) every micro-cluster within radius r; if none is close, a new
  * micro-cluster is created; the shared-density counter of every pair of MCs
  * that both absorb the point is incremented. Exponential decay fades stale
  * MCs/edges. Offline phase: MCs are vertices, an edge exists when the shared
  * density exceeds α·min(weight) — connected components are the clusters;
  * points are assigned to the cluster of their nearest MC within r (noise
  * otherwise).
  */
object DBStream {

  private final class MC(var center: Array[Double]) {
    var weight: Double   = 1.0
    var lastUpdate: Long = 0L
  }

  private def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  def run(points: IndexedSeq[Array[Double]], r: Double, lambda: Double = 1e-4,
          alpha: Double = 0.2, wMin: Double = 2.0): Array[Int] = {
    val mcs    = mutable.ArrayBuffer.empty[MC]
    val shared = mutable.HashMap.empty[(Int, Int), Double]
    var t      = 0L
    points.foreach { p =>
      t += 1
      val near = mutable.ArrayBuffer.empty[Int]
      var i = 0
      while (i < mcs.length) {
        if (dist(p, mcs(i).center) <= r) near += i
        i += 1
      }
      if (near.isEmpty) {
        val mc = new MC(p.clone()); mc.lastUpdate = t; mcs += mc
      } else {
        near.foreach { i =>
          val mc    = mcs(i)
          val decay = math.pow(2.0, -lambda * (t - mc.lastUpdate))
          mc.weight = mc.weight * decay + 1.0
          mc.lastUpdate = t
          // move the center toward p (Gaussian neighborhood function ≈ 0.5 here)
          var j = 0
          while (j < p.length) { mc.center(j) += 0.5 * (p(j) - mc.center(j)) / mc.weight; j += 1 }
        }
        var a = 0
        while (a < near.length) {
          var b = a + 1
          while (b < near.length) {
            val key = (near(a), near(b))
            shared(key) = shared.getOrElse(key, 0.0) + 1.0
            b += 1
          }
          a += 1
        }
      }
    }
    // offline: connected components over the shared-density graph
    val strong = mcs.indices.filter { i =>
      val mc = mcs(i)
      mc.weight * math.pow(2.0, -lambda * (t - mc.lastUpdate)) >= wMin
    }.toArray
    val pos = strong.zipWithIndex.toMap
    val uf  = new repro.core.UnionFind(strong.length)
    shared.foreach { case ((a, b), s) =>
      (pos.get(a), pos.get(b)) match {
        case (Some(pa), Some(pb)) =>
          val minW = math.min(mcs(a).weight, mcs(b).weight)
          if (s >= alpha * minW) uf.union(pa, pb)
        case _ =>
      }
    }
    val comp = uf.componentIds
    points.map { p =>
      var best = Double.PositiveInfinity
      var bi   = -1
      var i    = 0
      while (i < strong.length) {
        val d = dist(p, mcs(strong(i)).center)
        if (d < best) { best = d; bi = i }
        i += 1
      }
      if (bi >= 0 && best <= 2 * r) comp(bi) else -1
    }.toArray
  }
}
