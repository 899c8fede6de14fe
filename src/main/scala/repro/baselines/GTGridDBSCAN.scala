package repro.baselines

import repro.core.{DBSCANResult, EuclideanMetric, PointType, UnionFind}
import scala.collection.mutable

/** The grid-based exact / ρ-approximate DBSCAN of Gan & Tao (SIGMOD'15) —
  * the paper's `GT_Exact` / `GT_Approx` baselines. Euclidean-only by design
  * (the paper's point is exactly that grids do not generalize to metric
  * spaces and degrade with the dimension d).
  *
  * - Cells have side ε/√d, so a cell's diameter is ≤ ε: a cell with ≥ MinPts
  *   points is all-core.
  * - Core labeling: count neighbors over the O((2√d+3)^d)… in practice the
  *   cells within Chebyshev distance ⌈√d⌉ (any farther cell is > ε away).
  * - Exact merge: two core cells connect iff some core-point pair is ≤ ε
  *   (the BCP computed brute-force — the expensive part GT replace with
  *   geometric machinery in low d).
  * - ρ-approximate merge: connect if some pair is ≤ (1+ρ)ε, checked with the
  *   same scan but the relaxed threshold; by the sandwich theorem this yields
  *   a valid ρ-approximate clustering.
  */
object GTGridDBSCAN {

  def run(points: IndexedSeq[Array[Double]], eps: Double, minPts: Int,
          rho: Double = 0.0): DBSCANResult = {
    require(points.nonEmpty)
    val d    = points.head.length
    val side = eps / math.sqrt(d.toDouble)
    val n    = points.length

    def cellOf(p: Array[Double]): Vector[Long] =
      p.iterator.map(v => math.floor(v / side).toLong).toVector

    val cells = mutable.HashMap.empty[Vector[Long], mutable.ArrayBuffer[Int]]
    points.indices.foreach(i => cells.getOrElseUpdate(cellOf(points(i)), mutable.ArrayBuffer.empty) += i)
    val cellKeys = cells.keys.toIndexedSeq
    val cellPos  = cellKeys.zipWithIndex.toMap

    // Neighbor cells within Chebyshev radius ⌈√d⌉ that actually exist.
    val reach = math.ceil(math.sqrt(d.toDouble)).toInt
    def neighborCells(key: Vector[Long]): IndexedSeq[Int] = {
      // For d ≤ 3 enumerate offsets; beyond that enumeration explodes, so
      // scan existing cells instead (|cells| ≤ n keeps this quadratic-in-cells,
      // mirroring why GT is a low-d algorithm).
      if (d <= 3) {
        val offs = Iterator
          .fill(d)(-reach to reach)
          .foldLeft(Vector(Vector.empty[Long])) { (acc, r) =>
            acc.flatMap(v => r.map(o => v :+ o.toLong))
          }
        offs.flatMap(o => cellPos.get(key.indices.map(i => key(i) + o(i)).toVector)).toIndexedSeq
      } else {
        cellKeys.indices.filter { ci =>
          val other = cellKeys(ci)
          var ok = true
          var i  = 0
          while (i < d && ok) { ok = math.abs(other(i) - key(i)) <= reach; i += 1 }
          ok
        }
      }
    }

    // Core labeling.
    val isCore = new Array[Boolean](n)
    for ((key, members) <- cells) {
      if (members.length >= minPts) members.foreach(isCore(_) = true)
      else {
        val cand = neighborCells(key).flatMap(ci => cells(cellKeys(ci)))
        members.foreach { p =>
          var cnt = 0
          cand.foreach { q => if (EuclideanMetric.dist(points(p), points(q)) <= eps) cnt += 1 }
          isCore(p) = cnt >= minPts
        }
      }
    }

    // Merge core cells.
    val coreByCell = cellKeys.map(k => cells(k).filter(isCore).toArray)
    val uf         = new UnionFind(cellKeys.length)
    val mergeEps   = (1.0 + rho) * eps
    for (ci <- cellKeys.indices if coreByCell(ci).nonEmpty) {
      neighborCells(cellKeys(ci)).foreach { cj =>
        if (cj > ci && coreByCell(cj).nonEmpty && !uf.connected(ci, cj)) {
          var merged = false
          var a = 0
          while (a < coreByCell(ci).length && !merged) {
            var b = 0
            while (b < coreByCell(cj).length && !merged) {
              if (EuclideanMetric.dist(points(coreByCell(ci)(a)), points(coreByCell(cj)(b))) <= mergeEps) {
                uf.union(ci, cj); merged = true
              }
              b += 1
            }
            a += 1
          }
        }
      }
    }
    val cellLabel = {
      val ids = mutable.HashMap.empty[Int, Int]
      cellKeys.indices.map { ci =>
        if (coreByCell(ci).nonEmpty) ids.getOrElseUpdate(uf.find(ci), ids.size) else DBSCANResult.Noise
      }
    }

    val labels = Array.fill(n)(DBSCANResult.Noise)
    val types  = Array.fill(n)(PointType.Outlier)
    for (ci <- cellKeys.indices; p <- coreByCell(ci)) {
      labels(p) = cellLabel(ci); types(p) = PointType.Core
    }
    for ((key, members) <- cells; p <- members if !isCore(p)) {
      val cand = neighborCells(key).flatMap(ci => coreByCell(ci))
      var best = Double.PositiveInfinity
      var bq   = -1
      cand.foreach { q =>
        val dd = EuclideanMetric.dist(points(p), points(q))
        if (dd < best) { best = dd; bq = q }
      }
      if (bq >= 0 && best <= eps) { labels(p) = labels(bq); types(p) = PointType.Border }
    }
    DBSCANResult(labels, types)
  }
}
