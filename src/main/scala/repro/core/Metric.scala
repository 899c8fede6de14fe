package repro.core

/** A distance function over payload type `T`.
  *
  * Implementations must satisfy the metric axioms (identity, symmetry,
  * triangle inequality) — every complexity bound in the paper leans on the
  * triangle inequality, and `MetricSpec` property-tests it on samples.
  */
trait Metric[T] extends Serializable {
  def dist(a: T, b: T): Double
}

/** Plain Euclidean distance on dense vectors (t_dis = O(d)). */
object EuclideanMetric extends Metric[Array[Double]] {
  override def dist(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dimension mismatch: ${a.length} vs ${b.length}")
    var s  = 0.0
    var i  = 0
    val n  = a.length
    while (i < n) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }
}

/** Levenshtein edit distance — the paper's metric for the text datasets
  * (COLA, AG News, MRPC, MNLI). Classic O(|a|·|b|) dynamic program with a
  * two-row table.
  */
object EditDistanceMetric extends Metric[String] {
  override def dist(a: String, b: String): Double = {
    if (a == b) return 0.0
    if (a.isEmpty) return b.length.toDouble
    if (b.isEmpty) return a.length.toDouble
    val m    = b.length
    var prev = Array.tabulate(m + 1)(identity)
    var cur  = new Array[Int](m + 1)
    var i    = 1
    while (i <= a.length) {
      cur(0) = i
      var j = 1
      val ca = a.charAt(i - 1)
      while (j <= m) {
        val sub = prev(j - 1) + (if (ca == b.charAt(j - 1)) 0 else 1)
        val del = prev(j) + 1
        val ins = cur(j - 1) + 1
        cur(j) = math.min(sub, math.min(del, ins))
        j += 1
      }
      val tmp = prev; prev = cur; cur = tmp
      i += 1
    }
    prev(m).toDouble
  }
}
