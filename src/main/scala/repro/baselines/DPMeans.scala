package repro.baselines

import scala.util.Random

/** DP-means (Kulis & Jordan '11): Lloyd-style k-means where a point farther
  * than the penalty λ from every center spawns a new center. The paper's
  * Table 3 baseline; λ is set to the maximum distance of a k-center (Gonzalez)
  * initialization "following the suggested setting in their original paper".
  */
object DPMeans {

  final case class Output(labels: Array[Int], centers: IndexedSeq[Array[Double]], lambda: Double)

  /** λ from a Gonzalez k-center init with k = kInit. */
  def suggestLambda(points: IndexedSeq[Array[Double]], kInit: Int, seed: Long = 5): Double = {
    val rnd   = new Random(seed)
    val first = rnd.nextInt(points.length)
    val dists = points.map(p => dist(p, points(first))).toArray
    var it = 1
    while (it < kInit) {
      var far = 0
      var i   = 1
      while (i < points.length) { if (dists(i) > dists(far)) far = i; i += 1 }
      val c = points(far)
      i = 0
      while (i < points.length) {
        val d = dist(points(i), c)
        if (d < dists(i)) dists(i) = d
        i += 1
      }
      it += 1
    }
    dists.max
  }

  private def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  def run(points: IndexedSeq[Array[Double]], lambda: Double, maxIters: Int = 20): Output = {
    val n = points.length
    val d = points.head.length
    var centers = scala.collection.mutable.ArrayBuffer(points.head.clone())
    val labels  = new Array[Int](n)
    var changed = true
    var iter    = 0
    while (changed && iter < maxIters) {
      changed = false
      // assignment (points beyond λ open new clusters)
      var i = 0
      while (i < n) {
        var best  = Double.PositiveInfinity
        var bestC = -1
        var c     = 0
        while (c < centers.length) {
          val dd = dist(points(i), centers(c))
          if (dd < best) { best = dd; bestC = c }
          c += 1
        }
        if (best > lambda) {
          centers += points(i).clone()
          bestC = centers.length - 1
        }
        if (labels(i) != bestC) { labels(i) = bestC; changed = true }
        i += 1
      }
      // update means
      val sums   = Array.fill(centers.length)(new Array[Double](d))
      val counts = new Array[Int](centers.length)
      i = 0
      while (i < n) {
        val c = labels(i)
        counts(c) += 1
        var j = 0
        while (j < d) { sums(c)(j) += points(i)(j); j += 1 }
        i += 1
      }
      centers = centers.indices.collect {
        case c if counts(c) > 0 => sums(c).map(_ / counts(c))
      }.to(scala.collection.mutable.ArrayBuffer)
      // re-map labels after dropping empty clusters
      if (centers.isEmpty) centers += points.head.clone()
      i = 0
      while (i < n) {
        var best  = Double.PositiveInfinity
        var bestC = 0
        var c     = 0
        while (c < centers.length) {
          val dd = dist(points(i), centers(c))
          if (dd < best) { best = dd; bestC = c }
          c += 1
        }
        labels(i) = bestC
        i += 1
      }
      iter += 1
    }
    Output(labels, centers.toIndexedSeq, lambda)
  }
}
