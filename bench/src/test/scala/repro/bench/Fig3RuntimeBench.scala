package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig3Runtime

/** Figure 3 (shape, as a table) — running time of our exact/approx algorithms
  * vs DBSCAN, DBSCAN++, DYW_DBSCAN and the GT grids, over ε sweeps.
  * Paper's shape: our algorithms are fastest, especially on large /
  * high-dimensional / non-Euclidean data, and Our_Approx ≤ Our_Exact overall.
  */
class Fig3RuntimeBench extends AnyFunSuite {

  test("Figure 3: runtime comparison across eps") {
    val rows = Fig3Runtime.run(scale = 1.0)
    println(Fig3Runtime.render(rows))

    def total(algo: String): Double = rows.filter(_.algo == algo).map(_.millis).sum
    val ourExact  = total("Our_Exact")
    val ourApprox = total("Our_Approx")
    val naive     = total("DBSCAN")
    val dyw       = total("DYW_DBSCAN")

    // headline: our algorithms beat the original DBSCAN overall
    assert(ourExact < naive, f"Our_Exact $ourExact%.0f ms !< DBSCAN $naive%.0f ms")
    assert(ourApprox < naive, f"Our_Approx $ourApprox%.0f ms !< DBSCAN $naive%.0f ms")
    // and the quadratic-merge DYW baseline
    assert(ourApprox < dyw, f"Our_Approx $ourApprox%.0f ms !< DYW $dyw%.0f ms")

    // per-dataset: on the largest workload the gap is clear (paper: only our
    // algorithms finish GIST/DEEP1B within 10^6 s)
    val big = rows.filter(_.dataset == "Spotify_like")
    val bigOurs  = big.filter(_.algo == "Our_Approx").map(_.millis).sum
    val bigNaive = big.filter(_.algo == "DBSCAN").map(_.millis).sum
    assert(bigOurs < bigNaive / 2,
      f"on the largest dataset ours must be ≥2x faster ($bigOurs%.0f vs $bigNaive%.0f)")
  }
}
