package repro.exp

import repro.core.{EuclideanMetric, StreamingDBSCAN}

/** Figure 6 (shape only, as a table) — memory footprint of the streaming
  * algorithm measured as (|E| + |M|)/n for ρ ∈ {0.5, 1, 2}. The paper's
  * claim: a small ratio (≈1% on Fashion MNIST) that shrinks as ρ grows.
  */
object Fig6Memory {

  final case class Row(dataset: String, rho: Double, footprint: Int, n: Int) {
    def ratio: Double = footprint.toDouble / n
  }

  def workloads(scale: Double): Seq[VecWorkload] = Seq(
    Workloads.moons(scale, n = 4000),
    Workloads.mnistLike(scale),
    Workloads.fashionLike(scale),
    Workloads.cifarLike(scale)
  )

  def run(scale: Double = 1.0, rhos: Seq[Double] = Seq(0.5, 1.0, 2.0)): Seq[Row] =
    for (w <- workloads(scale); rho <- rhos) yield {
      val (_, engine) = StreamingDBSCAN.runBatch(w.ds.points, EuclideanMetric, w.eps, w.minPts, rho)
      Row(w.name, rho, engine.memoryFootprint, w.n)
    }

  def render(rows: Seq[Row]): String =
    TableFormat.render(
      "Figure 6 (as table): streaming memory (|E|+|M|)/n",
      Seq("Dataset", "rho", "|E|+|M|", "n", "ratio"),
      rows.map(r => Seq(r.dataset, r.rho.toString, r.footprint.toString, r.n.toString,
        f"${r.ratio * 100}%.2f%%"))
    )
}
