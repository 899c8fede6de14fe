package repro.exp

import repro.baselines.{BICO, DBStream, DStream, EvoStream}
import repro.core.{EuclideanMetric, StreamingDBSCAN}
import repro.eval.ClusterMetrics

/** Table 4 — ARI/AMI of our streaming ρ-approximate DBSCAN (Algorithm 3,
  * ρ = 0.5) vs the streaming baselines (DBStream, D-Stream, evoStream, BICO)
  * over the streamed datasets, including Spotify-like prefixes at
  * 1/10/50/100% of the stream.
  */
object Table4 {

  final case class Scores(ari: Double, ami: Double)
  final case class Row(name: String, ours: Scores, dbStream: Scores, dStream: Scores,
                       evoStream: Scores, bico: Scores)

  def workloads(scale: Double): Seq[VecWorkload] = Seq(
    Workloads.moons(scale, n = 4000),
    Workloads.cancer(scale),
    Workloads.arrhythmia(scale),
    Workloads.biodeg(scale),
    Workloads.mnistLike(scale),
    Workloads.cifarLike(scale),
    Workloads.fashionLike(scale),
    Workloads.uspsLike(scale),
    Workloads.pcamLike(scale),
    Workloads.lsunLike(scale)
  )

  private def score(truth: Array[Int], pred: Array[Int]): Scores =
    Scores(ClusterMetrics.ari(truth, pred), ClusterMetrics.ami(truth, pred))

  def evalOne(w: VecWorkload, rho: Double): Row = {
    val pts   = w.ds.points
    val truth = w.ds.labels
    val d     = pts.head.length
    val (ourLabels, _) = StreamingDBSCAN.runBatch(pts, EuclideanMetric, w.eps, w.minPts, rho)
    val dbs = DBStream.run(pts, r = w.eps)
    val dst = DStream.run(pts, cellSide = 2 * w.eps / math.sqrt(d.toDouble))
    val evo = EvoStream.run(pts, k = w.trueK, radius = w.eps)
    val bic = BICO.run(pts, k = w.trueK).labels
    Row(w.name, score(truth, ourLabels), score(truth, dbs), score(truth, dst),
        score(truth, evo), score(truth, bic))
  }

  def run(scale: Double = 1.0, rho: Double = 0.5): Seq[Row] = {
    val base = workloads(scale).map(evalOne(_, rho))
    // Spotify-like prefixes: the "same stream at 1/10/50/100%" experiment.
    val full = Workloads.spotifyLike(scale)
    val prefixes = Seq(0.01, 0.10, 0.50, 1.00).map { frac =>
      val m  = math.max(100, (full.n * frac).toInt)
      val ds = full.ds.copy(name = f"Spotify_like ${frac * 100}%.0f%%",
                            points = full.ds.points.take(m),
                            labels = full.ds.labels.take(m))
      evalOne(VecWorkload(ds, full.minPts, full.eps), rho)
    }
    base ++ prefixes
  }

  def render(rows: Seq[Row]): String = {
    import TableFormat.fmt
    TableFormat.render(
      "Table 4: streaming algorithms, ARI / AMI",
      Seq("Dataset", "Ours ARI", "AMI", "DBStream ARI", "AMI", "D-Stream ARI", "AMI",
          "evoStream ARI", "AMI", "BICO ARI", "AMI"),
      rows.map(r => Seq(r.name,
        fmt(r.ours.ari), fmt(r.ours.ami),
        fmt(r.dbStream.ari), fmt(r.dbStream.ami),
        fmt(r.dStream.ari), fmt(r.dStream.ami),
        fmt(r.evoStream.ari), fmt(r.evoStream.ami),
        fmt(r.bico.ari), fmt(r.bico.ami)))
    )
  }
}
