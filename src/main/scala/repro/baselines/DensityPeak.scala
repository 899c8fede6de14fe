package repro.baselines

import repro.core.Metric

/** Density-peak clustering (Rodriguez & Laio, Science '14) — Table 3 baseline.
  *
  * For each point: local density ρ_i = |{j : dis(i,j) < d_c}| and
  * δ_i = min distance to any higher-density point. Points with the top-k
  * γ = ρ·δ products are the cluster centers; everything else inherits the
  * cluster of its nearest higher-density neighbor (in decreasing-ρ order).
  * Optionally, points with density below `noiseRho` are marked noise (−1).
  * Θ(n²) distances, as in the original.
  */
object DensityPeak {

  def run[T](points: IndexedSeq[T], metric: Metric[T], dc: Double, k: Int,
             noiseRho: Int = 1): Array[Int] = {
    val n   = points.length
    val rho = new Array[Int](n)
    val dm  = Array.ofDim[Float](n, n) // n ≤ ~5k in our benches: 100 MB cap
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        val d = metric.dist(points(i), points(j)).toFloat
        dm(i)(j) = d; dm(j)(i) = d
        if (d < dc) { rho(i) += 1; rho(j) += 1 }
        j += 1
      }
      i += 1
    }
    val delta  = Array.fill(n)(Double.PositiveInfinity)
    val parent = Array.fill(n)(-1)
    val byRho  = (0 until n).sortBy(-rho(_)).toArray
    i = 1
    while (i < byRho.length) {
      val p = byRho(i)
      var j = 0
      while (j < i) {
        val q = byRho(j)
        val d = dm(p)(q).toDouble
        if (d < delta(p)) { delta(p) = d; parent(p) = q }
        j += 1
      }
      i += 1
    }
    // the global density max gets the largest delta by convention
    delta(byRho(0)) = if (n > 1) (0 until n).map(j => dm(byRho(0))(j).toDouble).max else 0.0

    val centers = (0 until n).sortBy(p => -rho(p).toDouble * delta(p)).take(k).toSet
    val labels  = Array.fill(n)(-2)
    var next    = 0
    byRho.foreach { p =>
      if (centers(p)) { labels(p) = next; next += 1 }
      else if (parent(p) >= 0) labels(p) = labels(parent(p))
      else labels(p) = 0
    }
    // low-density points are noise
    (0 until n).foreach(p => if (rho(p) < noiseRho) labels(p) = -1)
    labels
  }
}
