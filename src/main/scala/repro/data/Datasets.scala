package repro.data

import scala.util.Random
import repro.core.{EditDistanceMetric, EuclideanMetric, Metric}

/** A dataset with ground-truth labels for the quality experiments.
  *
  * @param labels ground truth: cluster id ≥ 0 for inliers, −1 for planted
  *               outliers/noise
  */
final case class MetricDataset[T](
    name: String,
    points: IndexedSeq[T],
    labels: Array[Int],
    metric: Metric[T]
) {
  def n: Int = points.length
}

/** Deterministic synthetic stand-ins for the paper's datasets (Table 1).
  *
  * Every generator is seeded and laptop-scale; see DESIGN.md §4 for the
  * paper-dataset → generator mapping and why each substitution preserves the
  * behaviour under test (low-doubling-dimension inliers + arbitrary outliers).
  */
object Datasets {

  type Vec = Array[Double]

  // ---------- 2D shape datasets -------------------------------------------

  /** Two interleaved half-moons (sklearn make_moons) + uniform outliers. */
  def moons(n: Int, noise: Double = 0.05, outlierFrac: Double = 0.01, seed: Long = 7): MetricDataset[Vec] = {
    val rnd  = new Random(seed)
    val nOut = (n * outlierFrac).toInt
    val nIn  = n - nOut
    val pts  = IndexedSeq.newBuilder[Vec]
    val lbl  = Array.newBuilder[Int]
    for (i <- 0 until nIn) {
      val t = rnd.nextDouble() * math.Pi
      val (x, y, l) =
        if (i % 2 == 0) (math.cos(t), math.sin(t), 0)
        else (1.0 - math.cos(t), 0.5 - math.sin(t), 1)
      pts += Array(x + rnd.nextGaussian() * noise, y + rnd.nextGaussian() * noise)
      lbl += l
    }
    for (_ <- 0 until nOut) {
      pts += Array(rnd.nextDouble() * 5 - 2, rnd.nextDouble() * 5 - 2)
      lbl += -1
    }
    MetricDataset(s"Moons", pts.result(), lbl.result(), EuclideanMetric)
  }

  /** Cluto-like 2D arbitrary shapes: three blobs + one ring + outliers. */
  def cluto(n: Int, outlierFrac: Double = 0.02, seed: Long = 11): MetricDataset[Vec] = {
    val rnd  = new Random(seed)
    val nOut = (n * outlierFrac).toInt
    val nIn  = n - nOut
    val pts  = IndexedSeq.newBuilder[Vec]
    val lbl  = Array.newBuilder[Int]
    // Three blobs, a ring, and a blob *inside* the ring — the inner blob is
    // what defeats centroid methods (they cannot separate concentric shapes)
    // while DBSCAN peels them apart, as on the Cluto t-series.
    val blobCenters = Array(Array(0.0, 0.0), Array(6.0, 0.0), Array(3.0, 6.0))
    for (i <- 0 until nIn) {
      i % 5 match {
        case 3 => // ring of radius 3 around (10, 6)
          val t = rnd.nextDouble() * 2 * math.Pi
          pts += Array(10 + 3 * math.cos(t) + rnd.nextGaussian() * 0.15,
                       6 + 3 * math.sin(t) + rnd.nextGaussian() * 0.15)
          lbl += 3
        case 4 => // blob inside the ring
          pts += Array(10 + rnd.nextGaussian() * 0.5, 6 + rnd.nextGaussian() * 0.5)
          lbl += 4
        case j =>
          val c = blobCenters(j)
          pts += Array(c(0) + rnd.nextGaussian() * 0.5, c(1) + rnd.nextGaussian() * 0.5)
          lbl += j
      }
    }
    for (_ <- 0 until nOut) {
      pts += Array(rnd.nextDouble() * 24 - 5, rnd.nextDouble() * 22 - 6)
      lbl += -1
    }
    MetricDataset("Cluto", pts.result(), lbl.result(), EuclideanMetric)
  }

  // ---------- tabular Gaussian mixtures ------------------------------------

  /** Gaussian blobs in d dims — stand-in for the UCI tabular sets. */
  def blobs(name: String, n: Int, d: Int, k: Int, std: Double = 1.0,
            sep: Double = 12.0, outlierFrac: Double = 0.01, seed: Long = 13): MetricDataset[Vec] = {
    val rnd     = new Random(seed)
    val centers = Array.fill(k, d)(rnd.nextGaussian() * sep)
    val nOut    = (n * outlierFrac).toInt
    val nIn     = n - nOut
    val pts     = IndexedSeq.newBuilder[Vec]
    val lbl     = Array.newBuilder[Int]
    for (i <- 0 until nIn) {
      val c = i % k
      pts += Array.tabulate(d)(j => centers(c)(j) + rnd.nextGaussian() * std)
      lbl += c
    }
    val lo = -3 * sep; val hi = 3 * sep
    for (_ <- 0 until nOut) {
      pts += Array.fill(d)(lo + rnd.nextDouble() * (hi - lo))
      lbl += -1
    }
    MetricDataset(name, pts.result(), lbl.result(), EuclideanMetric)
  }

  // ---------- high-dimensional low-intrinsic-dimension manifolds -----------

  /** k non-convex clusters sampled on a random dIntrinsic-dim subspace,
    * linearly embedded into ambient dimension d, values roughly in [0, 255] —
    * this is the paper's working assumption (low doubling dimension inliers
    * inside a high ambient dimension) made literal. Clusters come in
    * concentric pairs — a ring of radius 16 (even labels) around a compact
    * blob (odd labels) in the same grid cell — a geometry centroid methods
    * cannot separate but density clustering peels apart, mirroring the
    * structural advantage the paper's image datasets give DBSCAN.
    * Stand-in for the image datasets.
    */
  def manifold(name: String, n: Int, d: Int, dIntrinsic: Int, k: Int,
               clusterStd: Double = 1.0, ambientNoise: Double = 0.5,
               outlierFrac: Double = 0.01, seed: Long = 17): MetricDataset[Vec] = {
    val rnd = new Random(seed)
    // Random embedding, scaled so intrinsic distances survive.
    val embed = Array.fill(dIntrinsic, d)(rnd.nextGaussian() / math.sqrt(dIntrinsic))
    // One grid cell per ring+blob pair; a 65-unit grid keeps cells far apart
    // even when dIntrinsic is as low as 2 (the paper's low-doubling regime).
    val nCells = (k + 1) / 2
    val side = math.max(2, math.ceil(math.pow(nCells.toDouble, 1.0 / dIntrinsic)).toInt)
    val cellCenter = Array.tabulate(nCells) { c =>
      var rem = c
      Array.tabulate(dIntrinsic) { _ =>
        val g = rem % side; rem /= side
        g * 65.0 + rnd.nextGaussian() * 2.0
      }
    }
    def unit(): Vec = {
      val v = Array.fill(dIntrinsic)(rnd.nextGaussian())
      val nrm = math.sqrt(v.map(x => x * x).sum)
      v.map(_ / nrm)
    }
    // Orthonormal ring plane (u, v) per cell.
    val dirU = Array.fill(nCells)(unit())
    val dirV = Array.tabulate(nCells) { c =>
      val u = dirU(c); val w = unit()
      val proj = (0 until dIntrinsic).map(j => w(j) * u(j)).sum
      val raw  = Array.tabulate(dIntrinsic)(j => w(j) - proj * u(j))
      val nrm  = math.sqrt(raw.map(x => x * x).sum)
      if (nrm < 1e-9) u else raw.map(_ / nrm)
    }
    val nOut = (n * outlierFrac).toInt
    val nIn  = n - nOut
    val pts  = IndexedSeq.newBuilder[Vec]
    val lbl  = Array.newBuilder[Int]
    def embedPoint(z: Vec): Vec = {
      val x = new Array[Double](d)
      var i = 0
      while (i < dIntrinsic) {
        val zi = z(i)
        var j = 0
        while (j < d) { x(j) += zi * embed(i)(j); j += 1 }
        i += 1
      }
      // shift+scale into [0,255]-ish and add small full-dimensional noise
      var j = 0
      while (j < d) { x(j) = 128.0 + 6.0 * x(j) + rnd.nextGaussian() * ambientNoise; j += 1 }
      x
    }
    val RingR = 16.0
    for (i <- 0 until nIn) {
      val c    = i % k
      val cell = c / 2
      val base = cellCenter(cell)
      val z =
        if (c % 2 == 0) { // ring in the (u, v) plane of its cell
          val th = rnd.nextDouble() * 2 * math.Pi
          Array.tabulate(dIntrinsic) { j =>
            base(j) + RingR * (math.cos(th) * dirU(cell)(j) + math.sin(th) * dirV(cell)(j)) +
              rnd.nextGaussian() * clusterStd
          }
        } else { // compact blob at the cell center, inside the ring
          Array.tabulate(dIntrinsic)(j => base(j) + rnd.nextGaussian() * clusterStd)
        }
      pts += embedPoint(z)
      lbl += c
    }
    for (_ <- 0 until nOut) {
      pts += Array.fill(d)(rnd.nextDouble() * 255.0) // full-dim uniform: high intrinsic dim
      lbl += -1
    }
    MetricDataset(name, pts.result(), lbl.result(), EuclideanMetric)
  }

  /** The paper's own "noisy" recipe (Section 5.4): duplicate each base point
    * 10× with ±5 per-dimension jitter, then add 1% uniform noise in [0,255]^d.
    */
  def manifoldNoisy(name: String, nBase: Int, d: Int, dIntrinsic: Int, k: Int,
                    seed: Long = 19): MetricDataset[Vec] = {
    val base = manifold(name + "_base", nBase, d, dIntrinsic, k, outlierFrac = 0.0, seed = seed)
    val rnd  = new Random(seed + 1)
    val pts  = IndexedSeq.newBuilder[Vec]
    val lbl  = Array.newBuilder[Int]
    for (i <- base.points.indices; _ <- 0 until 10) {
      pts += base.points(i).map(v => v + (rnd.nextDouble() * 10.0 - 5.0))
      lbl += base.labels(i)
    }
    val nOut = (nBase * 10 * 0.01).toInt
    for (_ <- 0 until nOut) {
      pts += Array.fill(d)(rnd.nextDouble() * 255.0)
      lbl += -1
    }
    MetricDataset(name, pts.result(), lbl.result(), EuclideanMetric)
  }

  // ---------- text datasets under edit distance -----------------------------

  /** k template strings; members get ≤ maxEdits random character edits;
    * outliers are unrelated random strings. Metric = Levenshtein. Stand-in
    * for COLA / AG News / MRPC / MNLI.
    */
  def text(name: String, n: Int, k: Int, templateLen: Int = 40, maxEdits: Int = 4,
           outlierFrac: Double = 0.02, seed: Long = 23): MetricDataset[String] = {
    val rnd      = new Random(seed)
    val alphabet = "abcdefghijklmnopqrstuvwxyz "
    def randStr(len: Int): String =
      Iterator.fill(len)(alphabet(rnd.nextInt(alphabet.length))).mkString
    val templates = Array.fill(k)(randStr(templateLen))
    def mutate(s: String): String = {
      var cur = s
      val edits = 1 + rnd.nextInt(maxEdits)
      for (_ <- 0 until edits) {
        val pos = rnd.nextInt(math.max(1, cur.length))
        rnd.nextInt(3) match {
          case 0 if cur.length > 1 => cur = cur.substring(0, pos) + cur.substring(math.min(pos + 1, cur.length)) // delete
          case 1 => cur = cur.substring(0, pos) + alphabet(rnd.nextInt(alphabet.length)) + cur.substring(pos)   // insert
          case _ => // substitute
            val c = alphabet(rnd.nextInt(alphabet.length))
            cur = cur.substring(0, pos) + c + cur.substring(math.min(pos + 1, cur.length))
        }
      }
      cur
    }
    val nOut = (n * outlierFrac).toInt
    val nIn  = n - nOut
    val pts  = IndexedSeq.newBuilder[String]
    val lbl  = Array.newBuilder[Int]
    for (i <- 0 until nIn) {
      val c = i % k
      pts += mutate(templates(c))
      lbl += c
    }
    for (_ <- 0 until nOut) {
      pts += randStr(templateLen / 2 + rnd.nextInt(templateLen))
      lbl += -1
    }
    MetricDataset(name, pts.result(), lbl.result(), EditDistanceMetric)
  }

  // ---------- streaming dataset with drift ----------------------------------

  /** Spotify_Session stand-in: a 21-dim blob stream whose mixture weights
    * drift with stream position (early stream favours the first clusters,
    * late stream the last), so prefixes of different lengths look like
    * different datasets — matching how the paper splits Spotify by date.
    * Session features are highly correlated in reality, so the inliers live
    * on a 3-dim subspace of the 21-dim feature space (the paper's
    * low-doubling assumption); outliers are full-dimensional.
    */
  def spotifyLike(n: Int, k: Int = 6, d: Int = 21, dIntrinsic: Int = 3,
                  seed: Long = 29): MetricDataset[Vec] = {
    val rnd     = new Random(seed)
    val embed   = Array.fill(dIntrinsic, d)(rnd.nextGaussian() / math.sqrt(dIntrinsic))
    val centers = Array.fill(k, dIntrinsic)(rnd.nextGaussian() * 10.0)
    val pts     = IndexedSeq.newBuilder[Vec]
    val lbl     = Array.newBuilder[Int]
    val nOut    = (n * 0.01).toInt
    val outAt   = Set.tabulate(nOut)(i => (i.toLong * n / math.max(1, nOut)).toInt)
    for (i <- 0 until n) {
      if (outAt(i)) {
        pts += Array.fill(d)(rnd.nextDouble() * 80 - 40)
        lbl += -1
      } else {
        // drift: cluster proportions shift linearly with stream position
        val phase = i.toDouble / n
        val c     = math.min(k - 1, ((rnd.nextDouble() * 0.5 + phase * 0.5) * k).toInt)
        val z     = Array.tabulate(dIntrinsic)(j => centers(c)(j) + rnd.nextGaussian() * 0.8)
        pts += Array.tabulate(d) { jj =>
          (0 until dIntrinsic).map(j => z(j) * embed(j)(jj)).sum + rnd.nextGaussian() * 0.05
        }
        lbl += c
      }
    }
    MetricDataset("Spotify_like", pts.result(), lbl.result(), EuclideanMetric)
  }

  // ---------- ε selection heuristic ------------------------------------------

  /** The standard k-NN-distance heuristic for choosing DBSCAN's ε: the median
    * MinPts-th nearest-neighbor distance over a sample of the inliers. The
    * paper sweeps ε per dataset; we need a single deterministic pick.
    */
  def suggestEps[T](ds: MetricDataset[T], minPts: Int, sample: Int = 400,
                    quantile: Double = 0.5, seed: Long = 31): Double = {
    val rnd  = new Random(seed)
    val inl  = ds.points.indices.filter(ds.labels(_) >= 0)
    val base = if (inl.nonEmpty) inl else ds.points.indices
    val idx  = IndexedSeq.fill(math.min(sample, base.length))(base(rnd.nextInt(base.length)))
    val kths = idx.map { i =>
      val ds2 = idx.iterator.filter(_ != i).map(j => ds.metric.dist(ds.points(i), ds.points(j))).toArray
      java.util.Arrays.sort(ds2)
      ds2(math.min(minPts - 1, ds2.length - 1))
    }.sorted
    kths((quantile * (kths.length - 1)).toInt)
  }
}
