package repro.exp

import repro.core.ExactDBSCAN

/** Table 2 — the runtime proportion taken by the radius-guided Gonzalez
  * pre-processing (Algorithm 1) inside our exact DBSCAN. The paper reports
  * ≥ 60% (often ≥ 90%) across datasets, which is the argument for Remark 5:
  * parameter tuning can skip Algorithm 1 entirely.
  */
object Table2 {

  final case class Row(name: String, gonzalezMs: Double, totalMs: Double, proportion: Double)

  def workloads(scale: Double): Seq[Workload] = Seq(
    Workloads.moons(scale, n = 10000),
    Workloads.cancer(scale),
    Workloads.uspsLike(scale, n = 4000),
    Workloads.biodeg(scale),
    Workloads.mnistLike(scale, n = 4000),
    Workloads.fashionLike(scale, n = 4000),
    Workloads.arrhythmia(scale),
    Workloads.cifarLike(scale, n = 4000),
    Workloads.colaText(scale),
    Workloads.agnewsText(scale),
    Workloads.mrpcText(scale)
  )

  def run(scale: Double = 1.0): Seq[Row] =
    workloads(scale).map {
      case v: VecWorkload =>
        // first run warms the JIT; the second is the measurement
        ExactDBSCAN.run(v.ds.points, v.ds.metric, v.eps, v.minPts)
        toRow(v.name, ExactDBSCAN.run(v.ds.points, v.ds.metric, v.eps, v.minPts))
      case t: TextWorkload =>
        ExactDBSCAN.run(t.ds.points, t.ds.metric, t.eps, t.minPts)
        toRow(t.name, ExactDBSCAN.run(t.ds.points, t.ds.metric, t.eps, t.minPts))
    }

  private def toRow(name: String, out: ExactDBSCAN.Output): Row =
    Row(name, out.timings.gonzalezNs / 1e6, out.timings.totalNs / 1e6,
      out.timings.gonzalezFraction)

  def render(rows: Seq[Row]): String =
    TableFormat.render(
      "Table 2: runtime proportion of radius-guided Gonzalez in exact DBSCAN",
      Seq("Dataset", "Radius-guided Gonzalez (ms)", "Total time (ms)", "Proportion"),
      rows.map(r => Seq(r.name, f"${r.gonzalezMs}%.1f", f"${r.totalMs}%.1f", f"${r.proportion * 100}%.0f%%"))
    )
}
