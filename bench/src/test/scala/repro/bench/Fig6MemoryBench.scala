package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig6Memory

/** Figure 6 (shape, as a table) — streaming memory (|E|+|M|)/n for
  * ρ ∈ {0.5, 1, 2}. Paper's shape: small ratios (~1% at the paper's scale),
  * non-increasing in ρ.
  */
class Fig6MemoryBench extends AnyFunSuite {

  test("Figure 6: streaming memory ratio") {
    val rows = Fig6Memory.run(scale = 1.0)
    println(Fig6Memory.render(rows))

    rows.foreach { r =>
      assert(r.footprint < (r.n * 0.6).toInt, s"${r.dataset} rho=${r.rho}: footprint not ≪ n")
    }
    // at ρ = 2 the summary is an order of magnitude below n on every dataset
    rows.filter(_.rho == 2.0).foreach { r =>
      assert(r.footprint < r.n / 10, s"${r.dataset} rho=2: ${r.footprint} not ≪ n/10")
    }
    // within each dataset, footprint is non-increasing in rho
    rows.groupBy(_.dataset).foreach { case (ds, rs) =>
      val sorted = rs.sortBy(_.rho).map(_.footprint)
      assert(sorted == sorted.sortBy(-_), s"$ds: footprint should shrink with rho: $sorted")
    }
  }
}
