package repro.core

/** ρ-approximate metric DBSCAN via a core-point summary (Algorithm 2).
  *
  * Pipeline with r̄ = ρε/2 (so the net is much coarser than the exact
  * algorithm's ε/2-net when ρ < 1):
  *   - radius-guided Gonzalez → E, C_e, and A_e with the enlarged threshold
  *     4r̄ + ε (eq. (13));
  *   - summary S*: for each e ∈ E, add e itself if e is a core point, else
  *     add every core member of C_e (Lemma 8: at most MinPts of them);
  *   - merge inside S* at radius (1+ρ)ε with search restricted to
  *     (∪_{e∈A_s} C_e) ∩ S* (Lemma 11);
  *   - label the rest: p inherits c_p's id if c_p ∈ S*, else the id of any
  *     s ∈ S* with dis(p, s) ≤ (1 + ρ/2)ε, else outlier.
  *
  * Output respects Definition 2 (Theorem 2): maximality + ρ-relaxed
  * connectivity, every core point in exactly one cluster.
  */
object ApproxDBSCAN {

  final case class Timings(gonzalezNs: Long, summaryNs: Long, mergeNs: Long, labelNs: Long) {
    def totalNs: Long = gonzalezNs + summaryNs + mergeNs + labelNs
    def gonzalezFraction: Double = if (totalNs == 0) 0.0 else gonzalezNs.toDouble / totalNs
  }

  final case class Output(
      result: DBSCANResult,
      timings: Timings,
      numCenters: Int,
      summarySize: Int
  )

  def run[T](
      points: IndexedSeq[T],
      metric: Metric[T],
      eps: Double,
      minPts: Int,
      rho: Double,
      precomputed: Option[(GonzalezResult, Long)] = None
  ): Output = {
    require(eps > 0 && minPts >= 1 && rho > 0)
    val rBar = rho * eps / 2.0
    val n    = points.length

    val t0 = System.nanoTime()
    val (g, gonzalezNs) = precomputed match {
      case Some((res, ns)) => (res, ns)
      case None =>
        val r = Gonzalez.run(points, metric, rBar)
        (r, System.nanoTime() - t0)
    }
    val k = g.numCenters

    // ---- Build the summary S* -------------------------------------------
    val t1 = System.nanoTime()
    val A  = Gonzalez.neighborSets(points, metric, g, 4 * rBar + eps)

    /** |B(points(p), ε) ∩ X| restricted (safely, per Lemma 2) to A_e's region. */
    def neighborCount(p: Int, e: Int): Int = {
      val pp  = points(p)
      var cnt = 0
      var a   = 0
      while (a < A(e).length) {
        val cn = g.coverSets(A(e)(a))
        var j  = 0
        while (j < cn.length) {
          if (metric.dist(pp, points(cn(j))) <= eps) cnt += 1
          j += 1
        }
        a += 1
      }
      cnt
    }

    val isCenterCore = new Array[Boolean](k)
    val summary      = scala.collection.mutable.ArrayBuffer.empty[Int] // point indices
    var e = 0
    while (e < k) {
      val cIdx = g.centerIdx(e)
      // |C_e| ≥ MinPts ⇒ e is core without any distance evaluation
      // (C_e ⊆ B(e, r̄) ⊆ B(e, ε) since r̄ = ρε/2 ≤ ε for ρ ≤ 2).
      isCenterCore(e) =
        g.coverSets(e).length >= minPts || neighborCount(cIdx, e) >= minPts
      if (isCenterCore(e)) summary += cIdx
      else {
        val ce = g.coverSets(e)
        var i  = 0
        while (i < ce.length) {
          val p = ce(i)
          if (p != cIdx && neighborCount(p, e) >= minPts) summary += p
          i += 1
        }
      }
      e += 1
    }
    val sStar     = summary.toArray
    val inSummary = new Array[Boolean](n)
    sStar.foreach(inSummary(_) = true)
    val summaryNs = System.nanoTime() - t1

    // ---- Merge inside S* at (1+ρ)ε ---------------------------------------
    val t2 = System.nanoTime()
    // Bucket the summary by ball so the A_s restriction applies.
    val summaryByBall = Array.fill(k)(List.empty[Int]) // positions into sStar
    var si = 0
    while (si < sStar.length) {
      summaryByBall(g.assignment(sStar(si))) ::= si
      si += 1
    }
    val uf       = new UnionFind(sStar.length)
    val mergeEps = (1.0 + rho) * eps
    si = 0
    while (si < sStar.length) {
      val s  = sStar(si)
      val e0 = g.assignment(s)
      var a  = 0
      while (a < A(e0).length) {
        var lst = summaryByBall(A(e0)(a))
        while (lst.nonEmpty) {
          val sj = lst.head
          if (sj > si && !uf.connected(si, sj) &&
              metric.dist(points(s), points(sStar(sj))) <= mergeEps) uf.union(si, sj)
          lst = lst.tail
        }
        a += 1
      }
      si += 1
    }
    val sLabel  = uf.componentIds
    val mergeNs = System.nanoTime() - t2

    // ---- Label everything -------------------------------------------------
    val t3     = System.nanoTime()
    val labels = Array.fill(n)(DBSCANResult.Noise)
    val types  = Array.fill(n)(PointType.Outlier)
    si = 0
    while (si < sStar.length) {
      labels(sStar(si)) = sLabel(si)
      types(sStar(si))  = PointType.Core
      si += 1
    }
    // Summary position of each center that is in S* (for the c_p shortcut).
    val centerSummaryPos = Array.fill(k)(-1)
    si = 0
    while (si < sStar.length) {
      val e2 = g.assignment(sStar(si))
      if (g.centerIdx(e2) == sStar(si)) centerSummaryPos(e2) = si
      si += 1
    }
    val assignEps = (1.0 + rho / 2.0) * eps
    var p = 0
    while (p < n) {
      if (!inSummary(p)) {
        val e0 = g.assignment(p)
        if (centerSummaryPos(e0) >= 0) {
          labels(p) = sLabel(centerSummaryPos(e0))
          types(p)  = PointType.Border
        } else {
          // Search A_p's region of S* for an s within (1 + ρ/2)ε.
          val pp    = points(p)
          var found = -1
          var a     = 0
          while (a < A(e0).length && found < 0) {
            var lst = summaryByBall(A(e0)(a))
            while (lst.nonEmpty && found < 0) {
              val sj = lst.head
              if (metric.dist(pp, points(sStar(sj))) <= assignEps) found = sj
              lst = lst.tail
            }
            a += 1
          }
          if (found >= 0) {
            labels(p) = sLabel(found)
            types(p)  = PointType.Border
          }
        }
      }
      p += 1
    }
    val labelNs = System.nanoTime() - t3

    Output(DBSCANResult(labels, types), Timings(gonzalezNs, summaryNs, mergeNs, labelNs), k, sStar.length)
  }
}
