package repro.baselines

import scala.collection.mutable

/** D-Stream (Chen & Tu, KDD'07) — density grid stream clustering; Table 4
  * baseline. Each point lands in a grid cell whose decayed density is
  * incremented; after the stream, cells are classified dense/sparse by their
  * density relative to the average, and dense cells are merged into clusters
  * by (existing-)neighbor adjacency. Points map to their cell's cluster,
  * sparse-cell points to noise.
  *
  * Like every grid method it inherits the curse of dimensionality — the
  * paper's Table 4 shows it collapsing on the high-dimensional sets, which
  * this implementation reproduces (cells become singletons as d grows).
  */
object DStream {

  def run(points: IndexedSeq[Array[Double]], cellSide: Double,
          lambda: Double = 1e-4, cm: Double = 3.0): Array[Int] = {
    val d = points.head.length
    def cellOf(p: Array[Double]): Vector[Long] =
      p.iterator.map(v => math.floor(v / cellSide).toLong).toVector

    val density = mutable.HashMap.empty[Vector[Long], Double]
    val lastT   = mutable.HashMap.empty[Vector[Long], Long]
    var t       = 0L
    points.foreach { p =>
      t += 1
      val c   = cellOf(p)
      val old = density.getOrElse(c, 0.0)
      val dt  = t - lastT.getOrElse(c, t)
      density(c) = old * math.pow(2.0, -lambda * dt) + 1.0
      lastT(c)   = t
    }
    // Dense iff the decayed count reaches the absolute threshold Cm, as in
    // the original's dense/sparse grid classification.
    val cells = density.keys.toIndexedSeq
    val dense = cells.filter(density(_) >= cm)
    val pos   = dense.zipWithIndex.toMap

    // adjacency: Chebyshev distance 1 between dense cells
    val uf = new repro.core.UnionFind(dense.length)
    for (i <- dense.indices; j <- i + 1 until dense.length) {
      var adj = true
      var k   = 0
      while (k < d && adj) { adj = math.abs(dense(i)(k) - dense(j)(k)) <= 1; k += 1 }
      if (adj) uf.union(i, j)
    }
    val comp = uf.componentIds
    points.map { p =>
      pos.get(cellOf(p)).map(comp).getOrElse(-1)
    }.toArray
  }
}
