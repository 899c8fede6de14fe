package repro.exp

import repro.baselines.{BICO, DPMeans, DensityPeak, MeanShift}
import repro.core.{ApproxDBSCAN, ExactDBSCAN}
import repro.eval.ClusterMetrics

/** Table 3 — ARI/AMI of exact DBSCAN and our 0.5-approximate DBSCAN vs the
  * non-DBSCAN baselines (DP-means, BICO, Density-peak, Meanshift), against
  * planted ground truth. NaN (rendered "*") marks a baseline skipped for
  * exceeding its memory budget — mirroring the paper's ">500GB" entries for
  * Density-peak, proportionally scaled to this container.
  */
object Table3 {

  /** Density-peak materializes an n×n float matrix; cap it like the paper's
    * 500 GB cap, proportionally (4000² floats ≈ 64 MB here).
    */
  val DensityPeakMaxN = 4000

  final case class Scores(ari: Double, ami: Double)
  final case class Row(name: String, exact: Scores, approx: Scores, dpMeans: Scores,
                       bico: Scores, densityPeak: Scores, meanShift: Scores)

  def workloads(scale: Double): Seq[VecWorkload] = Seq(
    Workloads.moons(scale, n = 4000),
    Workloads.cluto(scale, n = 4000),
    Workloads.mnistLike(scale),
    Workloads.mnistNoisy(scale),
    Workloads.fashionLike(scale),
    Workloads.fashionNoisy(scale),
    Workloads.pcamLike(scale),
    Workloads.lsunLike(scale)
  )

  private def score(truth: Array[Int], pred: Array[Int]): Scores =
    Scores(ClusterMetrics.ari(truth, pred), ClusterMetrics.ami(truth, pred))

  def run(scale: Double = 1.0, rho: Double = 0.5): Seq[Row] =
    workloads(scale).map { w =>
      val pts   = w.ds.points
      val truth = w.ds.labels
      val exact  = ExactDBSCAN.run(pts, w.ds.metric, w.eps, w.minPts).result.labels
      val approx = ApproxDBSCAN.run(pts, w.ds.metric, w.eps, w.minPts, rho).result.labels
      val dp     = DPMeans.run(pts, DPMeans.suggestLambda(pts, w.trueK)).labels
      val bico   = BICO.run(pts, w.trueK).labels
      val dpk =
        if (w.n > DensityPeakMaxN) null
        else DensityPeak.run(pts, w.ds.metric, dc = w.eps, k = w.trueK, noiseRho = w.minPts / 2)
      val msBandwidth = w.eps * 2
      val msh = MeanShift.run(pts, msBandwidth, maxIters = 10)
      Row(
        w.name,
        score(truth, exact),
        score(truth, approx),
        score(truth, dp),
        score(truth, bico),
        if (dpk == null) Scores(Double.NaN, Double.NaN) else score(truth, dpk),
        score(truth, msh)
      )
    }

  def render(rows: Seq[Row]): String = {
    import TableFormat.fmt
    TableFormat.render(
      "Table 3: ARI / AMI vs non-DBSCAN baselines (* = memory budget exceeded)",
      Seq("Dataset", "DBSCAN ARI", "AMI", "0.5-approx ARI", "AMI", "DP-means ARI", "AMI",
          "BICO ARI", "AMI", "Density-peak ARI", "AMI", "Meanshift ARI", "AMI"),
      rows.map(r => Seq(r.name,
        fmt(r.exact.ari), fmt(r.exact.ami),
        fmt(r.approx.ari), fmt(r.approx.ami),
        fmt(r.dpMeans.ari), fmt(r.dpMeans.ami),
        fmt(r.bico.ari), fmt(r.bico.ami),
        fmt(r.densityPeak.ari), fmt(r.densityPeak.ami),
        fmt(r.meanShift.ari), fmt(r.meanShift.ami)))
    )
  }
}
