package repro.baselines

import scala.util.Random

/** BICO (Fichtenberger et al., ESA'13): a streaming k-means coreset ("BIRCH
  * meets coresets") followed by weighted k-means++ / Lloyd on the coreset.
  *
  * This implementation keeps BICO's essential mechanism — clustering features
  * (weight, linear sum) absorbed within a squared-error threshold T, with the
  * coreset size capped by doubling T and rebuilding — and flattens the
  * reference implementation's multi-level tree to one level, which affects
  * constants only. Requires k up front (the disadvantage Table 3/4 notes).
  */
object BICO {

  /** A clustering feature: representative point, weight, linear sum. */
  private final class CF(val rep: Array[Double]) {
    var weight: Double          = 0.0
    val sum: Array[Double]      = new Array[Double](rep.length)
    def add(p: Array[Double], w: Double): Unit = {
      weight += w
      var i = 0
      while (i < p.length) { sum(i) += w * p(i); i += 1 }
    }
    def centroid: Array[Double] = sum.map(_ / math.max(weight, 1e-12))
  }

  private def sq(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  final case class Output(labels: Array[Int], centers: IndexedSeq[Array[Double]], coresetSize: Int)

  def run(points: IndexedSeq[Array[Double]], k: Int, coresetCap: Int = 200,
          lloydIters: Int = 15, seed: Long = 7): Output = {
    require(points.nonEmpty && k >= 1)
    val rnd = new Random(seed)

    // ---- streaming phase: absorb points into CFs, rebuild on overflow ------
    var threshold = {
      // initial T: squared distance between two random points / 16
      val a = points(rnd.nextInt(points.length))
      val b = points(rnd.nextInt(points.length))
      math.max(1e-9, sq(a, b) / 16.0)
    }
    var cfs = scala.collection.mutable.ArrayBuffer.empty[CF]
    def insert(p: Array[Double], w: Double): Unit = {
      var best  = Double.PositiveInfinity
      var bestC = -1
      var c     = 0
      while (c < cfs.length) {
        val d = sq(p, cfs(c).rep)
        if (d < best) { best = d; bestC = c }
        c += 1
      }
      if (bestC >= 0 && best <= threshold) cfs(bestC).add(p, w)
      else { val cf = new CF(p.clone()); cf.add(p, w); cfs += cf }
    }
    def rebuild(): Unit = {
      threshold *= 2.0
      val old = cfs
      cfs = scala.collection.mutable.ArrayBuffer.empty[CF]
      old.foreach(cf => insert(cf.centroid, cf.weight))
    }
    points.foreach { p =>
      insert(p, 1.0)
      while (cfs.length > coresetCap) rebuild()
    }

    // ---- weighted k-means++ + Lloyd on the coreset --------------------------
    val reps    = cfs.map(_.centroid).toIndexedSeq
    val weights = cfs.map(_.weight).toIndexedSeq
    val kk      = math.min(k, reps.length)
    val centers = scala.collection.mutable.ArrayBuffer.empty[Array[Double]]
    centers += reps(rnd.nextInt(reps.length)).clone()
    while (centers.length < kk) {
      val d2 = reps.indices.map(i => weights(i) * centers.iterator.map(c => sq(reps(i), c)).min)
      val tot = d2.sum
      if (tot <= 0) centers += reps(rnd.nextInt(reps.length)).clone()
      else {
        var r = rnd.nextDouble() * tot
        var i = 0
        while (i < d2.length - 1 && r > d2(i)) { r -= d2(i); i += 1 }
        centers += reps(i).clone()
      }
    }
    val dDim = reps.head.length
    for (_ <- 0 until lloydIters) {
      val sums   = Array.fill(centers.length)(new Array[Double](dDim))
      val ws     = new Array[Double](centers.length)
      reps.indices.foreach { i =>
        var best = 0; var bd = Double.PositiveInfinity
        centers.indices.foreach { c =>
          val d = sq(reps(i), centers(c)); if (d < bd) { bd = d; best = c }
        }
        ws(best) += weights(i)
        var j = 0
        while (j < dDim) { sums(best)(j) += weights(i) * reps(i)(j); j += 1 }
      }
      centers.indices.foreach { c =>
        if (ws(c) > 0) centers(c) = sums(c).map(_ / ws(c))
      }
    }

    // final assignment of raw points
    val labels = points.map { p =>
      var best = 0; var bd = Double.PositiveInfinity
      centers.indices.foreach { c =>
        val d = sq(p, centers(c)); if (d < bd) { bd = d; best = c }
      }
      best
    }.toArray
    Output(labels, centers.toIndexedSeq, reps.length)
  }
}
