package repro.baselines

/** Mean shift with a flat kernel (Comaniciu & Meer '02) — Table 3 baseline.
  *
  * Each point iteratively moves to the mean of the input points within the
  * bandwidth until convergence; converged modes within bandwidth/2 are merged
  * into one cluster. Θ(n² · iterations) — the slowness Table 3's discussion
  * reports ("at least 5 times slower on average").
  */
object MeanShift {

  private def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  def run(points: IndexedSeq[Array[Double]], bandwidth: Double,
          maxIters: Int = 30, tol: Double = 1e-3): Array[Int] = {
    val n = points.length
    val d = points.head.length
    val modes = Array.tabulate(n)(points(_).clone())
    var i = 0
    while (i < n) {
      var iter  = 0
      var moved = Double.PositiveInfinity
      while (iter < maxIters && moved > tol * bandwidth) {
        val mean = new Array[Double](d)
        var cnt  = 0
        var j    = 0
        while (j < n) {
          if (dist(modes(i), points(j)) <= bandwidth) {
            var t = 0
            while (t < d) { mean(t) += points(j)(t); t += 1 }
            cnt += 1
          }
          j += 1
        }
        if (cnt > 0) {
          var t = 0
          while (t < d) { mean(t) /= cnt; t += 1 }
          moved = dist(modes(i), mean)
          modes(i) = mean
        } else moved = 0.0
        iter += 1
      }
      i += 1
    }
    // merge modes within bandwidth/2
    val labels  = Array.fill(n)(-1)
    val centers = scala.collection.mutable.ArrayBuffer.empty[Array[Double]]
    i = 0
    while (i < n) {
      var found = -1
      var c     = 0
      while (c < centers.length && found < 0) {
        if (dist(modes(i), centers(c)) <= bandwidth / 2) found = c
        c += 1
      }
      if (found < 0) { centers += modes(i); found = centers.length - 1 }
      labels(i) = found
      i += 1
    }
    labels
  }
}
