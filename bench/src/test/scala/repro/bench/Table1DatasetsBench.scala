package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Table1

/** Table 1 — generates every synthetic stand-in at bench scale and prints the
  * inventory (paper's Table 1 lists the real datasets; see EXPERIMENTS.md).
  */
class Table1DatasetsBench extends AnyFunSuite {

  test("Table 1: dataset inventory") {
    val rows = Table1.run(scale = 1.0)
    println(Table1.render(rows))
    assert(rows.length == 15)
    // each dataset must be non-trivial and carry planted structure
    rows.foreach { r =>
      assert(r.n >= 60, s"${r.name} too small")
      assert(r.k >= 2, s"${r.name} lacks cluster structure")
    }
    // the text datasets are non-Euclidean (dimension n/a)
    assert(rows.count(_.dims == "n/a") == 4)
  }
}
