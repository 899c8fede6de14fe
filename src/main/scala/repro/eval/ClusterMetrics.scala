package repro.eval

/** Adjusted Rand Index and Adjusted Mutual Information, matching the
  * definitions used by the paper ([37] Hubert & Arabie; [65] Vinh et al.).
  *
  * Noise convention: label −1 (and any negative label) is treated as one
  * ordinary cluster on each side — the sklearn convention, and the one that
  * makes "everything is noise" score ≈ 0 against a real labeling.
  *
  * AMI uses the exact expected mutual information (hypergeometric model,
  * log-gamma arithmetic) with arithmetic-mean normalization.
  */
object ClusterMetrics {

  private def contingency(a: Array[Int], b: Array[Int]): (Array[Array[Long]], Array[Long], Array[Long]) = {
    require(a.length == b.length && a.nonEmpty, "label arrays must be same nonempty length")
    def index(xs: Array[Int]): (Array[Int], Int) = {
      val map = scala.collection.mutable.HashMap.empty[Int, Int]
      val out = xs.map(x => map.getOrElseUpdate(x, map.size))
      (out, map.size)
    }
    val (ai, ka) = index(a)
    val (bi, kb) = index(b)
    val m = Array.ofDim[Long](ka, kb)
    var i = 0
    while (i < a.length) { m(ai(i))(bi(i)) += 1; i += 1 }
    val ra = m.map(_.sum)
    val rb = Array.tabulate(kb)(j => m.map(_(j)).sum)
    (m, ra, rb)
  }

  private def comb2(x: Long): Double = x.toDouble * (x - 1) / 2.0

  /** Adjusted Rand Index ∈ [-1, 1]; 1 = identical partitions, ~0 = random. */
  def ari(a: Array[Int], b: Array[Int]): Double = {
    val (m, ra, rb) = contingency(a, b)
    val n = a.length.toLong
    val sumIj = m.iterator.flatMap(_.iterator).map(comb2).sum
    val sumA  = ra.iterator.map(comb2).sum
    val sumB  = rb.iterator.map(comb2).sum
    val expected = sumA * sumB / comb2(n)
    val maxIdx   = (sumA + sumB) / 2.0
    if (math.abs(maxIdx - expected) < 1e-12) 1.0 // both trivial partitions
    else (sumIj - expected) / (maxIdx - expected)
  }

  private def lnGamma(x: Double): Double = {
    // Lanczos approximation, good to ~1e-13 for x > 0.
    val g = Array(676.5203681218851, -1259.1392167224028, 771.32342877765313,
      -176.61502916214059, 12.507343278686905, -0.13857109526572012,
      9.9843695780195716e-6, 1.5056327351493116e-7)
    if (x < 0.5) math.log(math.Pi / math.sin(math.Pi * x)) - lnGamma(1 - x)
    else {
      val z = x - 1
      var s = 0.99999999999980993
      var i = 0
      while (i < g.length) { s += g(i) / (z + i + 1); i += 1 }
      val t = z + g.length - 0.5
      0.5 * math.log(2 * math.Pi) + (z + 0.5) * math.log(t) - t + math.log(s)
    }
  }

  private def lnFact(x: Long): Double = lnGamma(x.toDouble + 1.0)

  /** Mutual information (nats) of the two labelings. */
  def mutualInformation(a: Array[Int], b: Array[Int]): Double = {
    val (m, ra, rb) = contingency(a, b)
    val n = a.length.toDouble
    var mi = 0.0
    for (i <- m.indices; j <- m(i).indices) {
      val nij = m(i)(j).toDouble
      if (nij > 0) mi += (nij / n) * math.log(n * nij / (ra(i) * rb(j)))
    }
    math.max(0.0, mi)
  }

  private def entropy(counts: Array[Long], n: Double): Double =
    -counts.iterator.filter(_ > 0).map { c => (c / n) * math.log(c / n) }.sum

  /** Exact expected MI under the permutation (hypergeometric) model.
    * Log-factorials are tabulated once (O(n)) so the triple loop stays cheap.
    */
  def expectedMutualInformation(ra: Array[Long], rb: Array[Long], n: Long): Double = {
    val lf = new Array[Double](n.toInt + 1)
    var t  = 1
    while (t <= n) { lf(t) = lf(t - 1) + math.log(t.toDouble); t += 1 }
    @inline def lnFactT(x: Long): Double = lf(x.toInt)
    var emi = 0.0
    val lnN = lnFactT(n)
    var i = 0
    while (i < ra.length) {
      val ai = ra(i)
      var j  = 0
      while (j < rb.length) {
        val bj  = rb(j)
        val lo  = math.max(1L, ai + bj - n)
        val hi  = math.min(ai, bj)
        var nij = lo
        while (nij <= hi) {
          val term = (nij.toDouble / n) * math.log(n.toDouble * nij / (ai.toDouble * bj))
          val lnP = lnFactT(ai) + lnFactT(bj) + lnFactT(n - ai) + lnFactT(n - bj) -
            lnN - lnFactT(nij) - lnFactT(ai - nij) - lnFactT(bj - nij) - lnFactT(n - ai - bj + nij)
          emi += term * math.exp(lnP)
          nij += 1
        }
        j += 1
      }
      i += 1
    }
    emi
  }

  /** Adjusted Mutual Information, arithmetic-mean normalization. */
  def ami(a: Array[Int], b: Array[Int]): Double = {
    val (m, ra, rb) = contingency(a, b)
    val n  = a.length.toLong
    if (ra.length == 1 && rb.length == 1) return 1.0
    val mi  = mutualInformation(a, b)
    val emi = expectedMutualInformation(ra, rb, n)
    val h   = (entropy(ra, n.toDouble) + entropy(rb, n.toDouble)) / 2.0
    val den = h - emi
    if (math.abs(den) < 1e-12) { if (math.abs(mi - emi) < 1e-12) 1.0 else 0.0 }
    else (mi - emi) / den
  }
}
