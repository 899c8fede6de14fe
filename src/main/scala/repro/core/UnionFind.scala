package repro.core

/** Disjoint-set union with path halving + union by size.
  *
  * Used to merge ε/2-net balls (exact DBSCAN, Step 2) and summary points
  * (Algorithm 2, line 9) into clusters.
  */
final class UnionFind(n: Int) extends Serializable {
  private val parent = Array.tabulate(n)(identity)
  private val size   = Array.fill(n)(1)

  def find(x: Int): Int = {
    var r = x
    while (parent(r) != r) {
      parent(r) = parent(parent(r)) // path halving
      r = parent(r)
    }
    r
  }

  /** Merge the sets containing `a` and `b`; returns true if they were disjoint. */
  def union(a: Int, b: Int): Boolean = {
    var ra = find(a); var rb = find(b)
    if (ra == rb) return false
    if (size(ra) < size(rb)) { val t = ra; ra = rb; rb = t }
    parent(rb) = ra
    size(ra) += size(rb)
    true
  }

  def connected(a: Int, b: Int): Boolean = find(a) == find(b)

  /** Canonical small-integer id per component, assigned in first-seen order. */
  def componentIds: Array[Int] = {
    val ids = new Array[Int](parent.length)
    val map = scala.collection.mutable.HashMap.empty[Int, Int]
    var i   = 0
    while (i < parent.length) {
      ids(i) = map.getOrElseUpdate(find(i), map.size)
      i += 1
    }
    ids
  }
}
