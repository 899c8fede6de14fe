package repro.core

import scala.collection.mutable.ArrayBuffer

/** Streaming ρ-approximate DBSCAN (Algorithm 3) — three passes over the
  * stream, memory O((Δ/ρε)^D + z) independent of n.
  *
  * Pass 1 (incremental net construction): each arriving point joins the first
  * existing ball within r̄ = ρε/2 or opens a new ball; per-ball counters of
  * "points seen within ε" promote ball centers to core (→ S*); points whose
  * ball center is not (yet) known to be core are buffered in M. A ball's
  * buffer is dropped the moment its center turns core, and since every C_e
  * member is within r̄ ≤ ε of e, a non-core ball holds < MinPts buffered
  * points — this is what bounds |M|.
  *
  * Pass 2: re-scan the stream to count exact ε-neighborhoods of the buffered
  * M-points; those that are core join S*. S* is then merged offline at
  * (1+ρ)ε exactly like Algorithm 2 line 9.
  *
  * Pass 3: re-scan to label every point (Algorithm 2 lines 10–20).
  *
  * The class is batch-incremental: feed any number of chunks to
  * [[observePass1]]/[[observePass2]]/[[labelPass3]]; this is the engine under
  * the Structured Streaming driver in `repro.spark`.
  */
final class StreamingDBSCAN[T: scala.reflect.ClassTag](
    metric: Metric[T],
    eps: Double,
    minPts: Int,
    rho: Double
) extends Serializable {
  require(eps > 0 && minPts >= 1 && rho > 0)
  val rBar: Double = rho * eps / 2.0

  // ---- state --------------------------------------------------------------
  private val centers      = ArrayBuffer.empty[T]       // E
  private val epsCount     = ArrayBuffer.empty[Int]     // |B(e, ε)| seen so far
  private val centerCore   = ArrayBuffer.empty[Boolean] // e promoted to core?
  private val buffers      = ArrayBuffer.empty[ArrayBuffer[T]] // M, bucketed by ball
  private var pass1Done    = false
  private var pass2Started = false
  // After pass 2 / merge:
  private var mCandidates: Array[T]   = _
  private var mCounts: Array[Int]     = _
  private var summaryPts: Array[T]    = _
  private var summaryLbl: Array[Int]  = _
  private var centerSummaryPos: Array[Int] = _ // ball -> summary position (or -1)
  private var merged = false

  def numBalls: Int = centers.length

  /** |E| + |M| — the memory footprint the paper plots in Figure 6. */
  def memoryFootprint: Int = centers.length + buffers.iterator.map(_.length).sum

  // ---- Pass 1 ---------------------------------------------------------------
  /** Feed a chunk of the stream to pass 1. */
  def observePass1(chunk: IterableOnce[T]): Unit = {
    require(!pass1Done, "pass 1 already finished")
    chunk.iterator.foreach { p =>
      var assigned = -1
      var e        = 0
      val k        = centers.length
      while (e < k) {
        val d = metric.dist(p, centers(e))
        if (d <= eps) {
          epsCount(e) += 1
          if (!centerCore(e) && epsCount(e) >= minPts) {
            centerCore(e) = true
            buffers(e).clear() // ball went dense: its members need no pass-2 check
          }
        }
        if (assigned < 0 && d <= rBar) assigned = e
        e += 1
      }
      if (assigned < 0) {
        // New ball centered at p. The center itself counts toward its ball.
        centers += p
        epsCount += 1
        centerCore += (minPts <= 1)
        buffers += ArrayBuffer.empty[T]
        assigned = centers.length - 1
      }
      if (!centerCore(assigned)) buffers(assigned) += p
    }
  }

  /** Finish pass 1: prune buffers of balls that turned core late. */
  def finishPass1(): Unit = {
    if (pass1Done) return
    pass1Done = true
    var e = 0
    while (e < centers.length) {
      if (centerCore(e)) buffers(e).clear()
      e += 1
    }
  }

  // ---- Pass 2 ---------------------------------------------------------------
  /** Feed a chunk of the (re-scanned) stream to pass 2: exact ε-neighborhood
    * counting for the buffered M-candidates.
    */
  def observePass2(chunk: IterableOnce[T]): Unit = {
    require(pass1Done, "finishPass1() first")
    if (!pass2Started) {
      pass2Started = true
      mCandidates = buffers.iterator.flatMap(_.iterator).toArray
      mCounts     = new Array[Int](mCandidates.length)
    }
    chunk.iterator.foreach { q =>
      var i = 0
      while (i < mCandidates.length) {
        if (metric.dist(q, mCandidates(i)) <= eps) mCounts(i) += 1
        i += 1
      }
    }
  }

  /** Close pass 2 and merge S* offline at (1+ρ)ε (Algorithm 2 line 9). */
  def mergeSummary(): Unit = {
    require(pass1Done, "finishPass1() first")
    if (merged) return
    if (!pass2Started) { mCandidates = buffers.iterator.flatMap(_.iterator).toArray; mCounts = new Array[Int](mCandidates.length) }
    merged = true
    val pts = ArrayBuffer.empty[T]
    centerSummaryPos = Array.fill(centers.length)(-1)
    var e = 0
    while (e < centers.length) {
      if (centerCore(e)) { centerSummaryPos(e) = pts.length; pts += centers(e) }
      e += 1
    }
    var i = 0
    while (i < mCandidates.length) {
      if (mCounts(i) >= minPts) pts += mCandidates(i)
      i += 1
    }
    summaryPts = pts.toArray
    val uf       = new UnionFind(summaryPts.length)
    val mergeEps = (1.0 + rho) * eps
    var a = 0
    while (a < summaryPts.length) {
      var b = a + 1
      while (b < summaryPts.length) {
        if (!uf.connected(a, b) && metric.dist(summaryPts(a), summaryPts(b)) <= mergeEps)
          uf.union(a, b)
        b += 1
      }
      a += 1
    }
    summaryLbl = uf.componentIds
  }

  def summarySize: Int = { require(merged, "mergeSummary() first"); summaryPts.length }

  // ---- Pass 3 ---------------------------------------------------------------
  /** Label a chunk of the (re-scanned) stream: cluster id or Noise per point. */
  def labelPass3(chunk: IterableOnce[T]): Iterator[Int] = {
    require(merged, "mergeSummary() first")
    val assignEps = (1.0 + rho / 2.0) * eps
    chunk.iterator.map { p =>
      // c_p = first ball within r̄, matching the pass-1 assignment rule.
      var cp = -1
      var e  = 0
      while (e < centers.length && cp < 0) {
        if (metric.dist(p, centers(e)) <= rBar) cp = e
        e += 1
      }
      if (cp >= 0 && centerSummaryPos(cp) >= 0) summaryLbl(centerSummaryPos(cp))
      else {
        var found = -1
        var s     = 0
        while (s < summaryPts.length && found < 0) {
          if (metric.dist(p, summaryPts(s)) <= assignEps) found = s
          s += 1
        }
        if (found >= 0) summaryLbl(found) else DBSCANResult.Noise
      }
    }
  }
}

object StreamingDBSCAN {

  /** Convenience: run all three passes over an in-memory dataset, re-scanning
    * it once per pass exactly as a bounded stream would be replayed.
    */
  def runBatch[T: scala.reflect.ClassTag](
      points: IndexedSeq[T],
      metric: Metric[T],
      eps: Double,
      minPts: Int,
      rho: Double,
      chunkSize: Int = 1024
  ): (Array[Int], StreamingDBSCAN[T]) = {
    val s = new StreamingDBSCAN[T](metric, eps, minPts, rho)
    points.grouped(chunkSize).foreach(s.observePass1)
    s.finishPass1()
    points.grouped(chunkSize).foreach(s.observePass2)
    s.mergeSummary()
    val labels = points.grouped(chunkSize).flatMap(s.labelPass3).toArray
    (labels, s)
  }
}
