package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Table2

/** Table 2 — the runtime share of the radius-guided Gonzalez pre-processing
  * inside exact DBSCAN. Paper's claim: the proportion is large (64–99%),
  * so parameter tuning that skips Algorithm 1 (Remark 5) saves most of the
  * runtime. The shape assertion: Algorithm 1 dominates on average.
  */
class Table2GonzalezProportionBench extends AnyFunSuite {

  test("Table 2: Gonzalez runtime proportion") {
    val rows = Table2.run(scale = 1.0)
    println(Table2.render(rows))
    assert(rows.length == 11)
    rows.foreach(r => assert(r.totalMs >= r.gonzalezMs))
    val avg = rows.map(_.proportion).sum / rows.length
    assert(avg >= 0.5, f"average Gonzalez share $avg%.2f should dominate (paper: 0.64–0.99)")
    assert(rows.count(_.proportion >= 0.5) >= rows.length / 2,
      "Gonzalez should take the majority of time on most datasets")
  }
}
