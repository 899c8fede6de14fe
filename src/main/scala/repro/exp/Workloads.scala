package repro.exp

import repro.data.{Datasets, MetricDataset}

/** A dataset + the DBSCAN parameters the experiments use on it. */
sealed trait Workload {
  def name: String
  def n: Int
  def dims: String
  def minPts: Int
  def eps: Double
  def trueK: Int
}

final case class VecWorkload(ds: MetricDataset[Array[Double]], minPts: Int, eps: Double)
    extends Workload {
  def name: String = ds.name
  def n: Int       = ds.n
  def dims: String = ds.points.head.length.toString
  def trueK: Int   = ds.labels.filter(_ >= 0).distinct.length
}

final case class TextWorkload(ds: MetricDataset[String], minPts: Int, eps: Double)
    extends Workload {
  def name: String = ds.name
  def n: Int       = ds.n
  def dims: String = "n/a"
  def trueK: Int   = ds.labels.filter(_ >= 0).distinct.length
}

/** The synthetic workload registry used across all tables (see DESIGN.md §4
  * for the paper-dataset → generator substitutions). `scale` < 1 shrinks n
  * for fast unit runs; benchmarks use scale = 1.
  */
object Workloads {
  val MinPts = 10 // fixed throughout the paper's experiments (Section 5.2)

  private def sz(n: Int, scale: Double): Int = math.max(60, (n * scale).toInt)

  /** ε = factor × (median MinPts-th NN distance). The bare k-NN median is a
    * *lower* bound for a good DBSCAN ε: at 1× the ε/2-net degenerates to
    * almost one ball per point (no speedup, |E|+|M| ≈ n). The paper sweeps ε
    * per dataset ("adjust ε within a reasonable range"); the per-dataset
    * factors below sit inside each generator's good range — above the
    * within-cluster point spacing, well below the planted cluster
    * separations (verified by the Table 3/4 quality benches).
    */
  private def vec(ds: MetricDataset[Array[Double]], factor: Double): VecWorkload =
    VecWorkload(ds, MinPts, Datasets.suggestEps(ds, MinPts) * factor)

  private def txt(ds: MetricDataset[String], factor: Double): TextWorkload =
    TextWorkload(ds, MinPts, Datasets.suggestEps(ds, MinPts) * factor)

  def moons(scale: Double = 1.0, n: Int = 4000): VecWorkload =
    vec(Datasets.moons(sz(n, scale)), factor = 1.3)
  def cluto(scale: Double = 1.0, n: Int = 4000): VecWorkload =
    vec(Datasets.cluto(sz(n, scale)), factor = 1.5)
  def cancer(scale: Double = 1.0): VecWorkload =
    vec(Datasets.blobs("Cancer", sz(569, scale), d = 32, k = 2, seed = 41), factor = 2.0)
  def arrhythmia(scale: Double = 1.0): VecWorkload =
    vec(Datasets.blobs("Arrhythmia", sz(452, scale), d = 262, k = 4, seed = 43), factor = 2.0)
  def biodeg(scale: Double = 1.0): VecWorkload =
    vec(Datasets.blobs("Biodeg", sz(1055, scale), d = 41, k = 2, seed = 47), factor = 2.0)
  def mnistLike(scale: Double = 1.0, n: Int = 3000): VecWorkload =
    vec(Datasets.manifold("MNIST", sz(n, scale), d = 64, dIntrinsic = 2, k = 10, seed = 53), factor = 1.75)
  def fashionLike(scale: Double = 1.0, n: Int = 3000): VecWorkload =
    vec(Datasets.manifold("Fashion", sz(n, scale), d = 64, dIntrinsic = 2, k = 10, seed = 59), factor = 1.75)
  def uspsLike(scale: Double = 1.0, n: Int = 3000): VecWorkload =
    vec(Datasets.manifold("USPS_HW", sz(n, scale), d = 64, dIntrinsic = 2, k = 10, seed = 61), factor = 1.75)
  def cifarLike(scale: Double = 1.0, n: Int = 3000): VecWorkload =
    vec(Datasets.manifold("CIFAR_10", sz(n, scale), d = 128, dIntrinsic = 3, k = 10, seed = 67), factor = 1.75)
  def pcamLike(scale: Double = 1.0, n: Int = 5000): VecWorkload =
    vec(Datasets.manifold("PCAM", sz(n, scale), d = 128, dIntrinsic = 3, k = 2,
      seed = 71), factor = 1.75)
  def lsunLike(scale: Double = 1.0, n: Int = 5000): VecWorkload =
    vec(Datasets.manifold("LSUN", sz(n, scale), d = 128, dIntrinsic = 3, k = 10,
      seed = 73), factor = 1.75)
  def mnistNoisy(scale: Double = 1.0, nBase: Int = 400): VecWorkload =
    vec(Datasets.manifoldNoisy("MNIST_noisy", sz(nBase, scale), d = 64, dIntrinsic = 2, k = 10, seed = 53), factor = 1.75)
  def fashionNoisy(scale: Double = 1.0, nBase: Int = 400): VecWorkload =
    vec(Datasets.manifoldNoisy("Fashion_noisy", sz(nBase, scale), d = 64, dIntrinsic = 2, k = 10, seed = 59), factor = 1.75)
  def colaText(scale: Double = 1.0): TextWorkload =
    txt(Datasets.text("COLA", sz(515, scale), k = 5, seed = 79), factor = 2.5)
  def agnewsText(scale: Double = 1.0): TextWorkload =
    txt(Datasets.text("AG_News", sz(2000, scale), k = 4, seed = 83), factor = 2.5)
  def mrpcText(scale: Double = 1.0): TextWorkload =
    txt(Datasets.text("MRPC", sz(1000, scale), k = 5, seed = 89), factor = 2.5)
  def mnliText(scale: Double = 1.0): TextWorkload =
    txt(Datasets.text("MNLI", sz(2000, scale), k = 5, seed = 97), factor = 2.5)
  def spotifyLike(scale: Double = 1.0, n: Int = 20000): VecWorkload =
    vec(Datasets.spotifyLike(sz(n, scale)), factor = 2.5)
}
