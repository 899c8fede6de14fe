package repro.exp

/** Table 1 — the dataset inventory. For the reproduction this documents the
  * synthetic stand-in actually generated for each paper dataset (name, n,
  * dimension, #planted clusters, #planted outliers).
  */
object Table1 {

  final case class Row(name: String, n: Int, dims: String, k: Int, outliers: Int)

  def workloads(scale: Double): Seq[Workload] = Seq(
    Workloads.moons(scale, n = 10000),
    Workloads.cancer(scale),
    Workloads.arrhythmia(scale),
    Workloads.biodeg(scale),
    Workloads.mnistLike(scale),
    Workloads.fashionLike(scale),
    Workloads.uspsLike(scale),
    Workloads.cifarLike(scale),
    Workloads.pcamLike(scale),
    Workloads.lsunLike(scale),
    Workloads.colaText(scale),
    Workloads.agnewsText(scale),
    Workloads.mrpcText(scale),
    Workloads.mnliText(scale),
    Workloads.spotifyLike(scale)
  )

  def run(scale: Double = 1.0): Seq[Row] =
    workloads(scale).map { w =>
      val outliers = w match {
        case v: VecWorkload  => v.ds.labels.count(_ < 0)
        case t: TextWorkload => t.ds.labels.count(_ < 0)
      }
      Row(w.name, w.n, w.dims, w.trueK, outliers)
    }

  def render(rows: Seq[Row]): String =
    TableFormat.render(
      "Table 1: datasets (synthetic stand-ins)",
      Seq("Dataset", "n", "Dimension", "k", "planted outliers"),
      rows.map(r => Seq(r.name, r.n.toString, r.dims, r.k.toString, r.outliers.toString))
    )
}
