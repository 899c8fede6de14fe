package repro.exp

import repro.baselines.{DBSCANPlusPlus, DYWDBSCAN, GTGridDBSCAN, NaiveDBSCAN}
import repro.core.{ApproxDBSCAN, ExactDBSCAN}

/** Figure 3 (shape only, as a table) — running time of Our_Exact / Our_Approx
  * vs DBSCAN, DBSCAN++, DYW_DBSCAN, GT_Exact, GT_Approx with varying ε.
  * "n/a" marks algorithms that cannot run on a dataset class (GT grids need
  * Euclidean coordinates; the paper likewise omits baselines per subfigure).
  */
object Fig3Runtime {

  final case class Row(dataset: String, epsFactor: Double, algo: String, millis: Double)

  def workloads(scale: Double): Seq[Workload] = Seq(
    Workloads.moons(scale, n = 10000),  // low-dimensional
    Workloads.mnistLike(scale),         // high-dimensional
    Workloads.agnewsText(scale),        // non-Euclidean (edit distance)
    Workloads.spotifyLike(scale, n = 20000) // "large-scale" stand-in
  )

  private def time[A](body: => A): Double = {
    val t0 = System.nanoTime(); body; (System.nanoTime() - t0) / 1e6
  }

  def run(scale: Double = 1.0, rho: Double = 0.5,
          epsFactors: Seq[Double] = Seq(1.0, 1.5)): Seq[Row] =
    workloads(scale).flatMap { w =>
      epsFactors.flatMap { f =>
        val eps = w.eps * f
        val rows = scala.collection.mutable.ArrayBuffer.empty[Row]
        def rec(algo: String, ms: Double): Unit = {
          rows += Row(w.name, f, algo, ms)
          Console.err.println(f"[Fig3Runtime] ${w.name} epsFactor=$f $algo: $ms%.1f ms")
        }
        w match {
          case v: VecWorkload =>
            val pts = v.ds.points; val m = v.ds.metric
            val z   = v.ds.labels.count(_ < 0)
            rec("Our_Exact",  time(ExactDBSCAN.run(pts, m, eps, v.minPts)))
            rec("Our_Approx", time(ApproxDBSCAN.run(pts, m, eps, v.minPts, rho)))
            rec("DBSCAN",     time(NaiveDBSCAN.run(pts, m, eps, v.minPts)))
            rec("DBSCAN++",   time(DBSCANPlusPlus.run(pts, m, eps, v.minPts)))
            rec("DYW_DBSCAN", time(DYWDBSCAN.run(pts, m, eps, v.minPts, zEstimate = math.max(1, z))))
            // GT grids: only meaningful in low d (cells explode otherwise).
            if (pts.head.length <= 3) {
              rec("GT_Exact",  time(GTGridDBSCAN.run(pts, eps, v.minPts, rho = 0.0)))
              rec("GT_Approx", time(GTGridDBSCAN.run(pts, eps, v.minPts, rho = rho)))
            }
          case t: TextWorkload =>
            val pts = t.ds.points; val m = t.ds.metric
            val z   = t.ds.labels.count(_ < 0)
            rec("Our_Exact",  time(ExactDBSCAN.run(pts, m, eps, t.minPts)))
            rec("Our_Approx", time(ApproxDBSCAN.run(pts, m, eps, t.minPts, rho)))
            rec("DBSCAN",     time(NaiveDBSCAN.run(pts, m, eps, t.minPts)))
            rec("DBSCAN++",   time(DBSCANPlusPlus.run(pts, m, eps, t.minPts)))
            rec("DYW_DBSCAN", time(DYWDBSCAN.run(pts, m, eps, t.minPts, zEstimate = math.max(1, z))))
        }
        rows
      }
    }

  def render(rows: Seq[Row]): String =
    TableFormat.render(
      "Figure 3 (as table): running time (ms) with varying ε",
      Seq("Dataset", "ε factor", "Algorithm", "ms"),
      rows.map(r => Seq(r.dataset, r.epsFactor.toString, r.algo, f"${r.millis}%.1f"))
    )
}
