package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Table4

/** Table 4 — our streaming ρ-approximate DBSCAN (Algorithm 3) vs DBStream,
  * D-Stream, evoStream and BICO. Paper's shape: ours achieves the best (or
  * tied) quality on most test instances; grid-based D-Stream collapses on
  * high-dimensional data.
  */
class Table4StreamingBench extends AnyFunSuite {

  test("Table 4: streaming ARI/AMI comparison") {
    val rows = Table4.run(scale = 1.0)
    println(Table4.render(rows))
    assert(rows.length == 14)

    // ours wins or ties (within 0.02 ARI) on the majority of instances
    val wins = rows.count { r =>
      val best = Seq(r.dbStream.ari, r.dStream.ari, r.evoStream.ari, r.bico.ari).max
      r.ours.ari >= best - 0.02
    }
    assert(wins >= rows.length / 2, s"ours should lead on most instances, won $wins/${rows.length}")

    // D-Stream collapses on the high-dimensional image-like sets (paper: "-")
    val highD = rows.filter(r => Seq("MNIST", "CIFAR_10", "Fashion", "USPS_HW", "PCAM", "LSUN")
      .contains(r.name))
    assert(highD.forall(_.dStream.ari < 0.3), "grid D-Stream must degrade in high dimension")

    // Moons: ours near-perfect (paper: 0.97), baselines clearly below
    val moons = rows.find(_.name == "Moons").get
    assert(moons.ours.ari >= 0.8, s"Moons streaming ARI ${moons.ours.ari}")
  }
}
