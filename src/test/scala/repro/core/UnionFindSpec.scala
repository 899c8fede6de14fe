package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class UnionFindSpec extends AnyFunSuite {

  test("singletons are disjoint") {
    val uf = new UnionFind(5)
    for (i <- 0 until 5; j <- 0 until 5 if i != j) assert(!uf.connected(i, j))
  }

  test("union connects, transitively") {
    val uf = new UnionFind(6)
    assert(uf.union(0, 1))
    assert(uf.union(1, 2))
    assert(uf.connected(0, 2))
    assert(!uf.union(0, 2)) // already together
    assert(!uf.connected(0, 3))
    uf.union(3, 4)
    uf.union(2, 3)
    assert(uf.connected(0, 4))
    assert(!uf.connected(0, 5))
  }

  test("componentIds: one id per component, first-seen order") {
    val uf = new UnionFind(5)
    uf.union(1, 3)
    val ids = uf.componentIds
    assert(ids(0) == 0)
    assert(ids(1) == 1 && ids(3) == 1)
    assert(ids(2) == 2)
    assert(ids(4) == 3)
  }

  test("agrees with brute-force reachability on random union sequences") {
    val rnd = new Random(7)
    for (trial <- 0 until 30) {
      val n   = 2 + rnd.nextInt(40)
      val uf  = new UnionFind(n)
      val adj = Array.fill(n, n)(false)
      for (_ <- 0 until rnd.nextInt(60)) {
        val a = rnd.nextInt(n); val b = rnd.nextInt(n)
        uf.union(a, b)
        adj(a)(b) = true; adj(b)(a) = true
      }
      // brute-force transitive closure
      val reach = Array.tabulate(n, n)((i, j) => i == j || adj(i)(j))
      for (k <- 0 until n; i <- 0 until n; j <- 0 until n)
        if (reach(i)(k) && reach(k)(j)) reach(i)(j) = true
      for (i <- 0 until n; j <- 0 until n)
        assert(uf.connected(i, j) == reach(i)(j), s"trial $trial: $i~$j")
    }
  }
}
