package repro.core

/** Point classification per the DBSCAN definitions (Section 1.1.1). */
object PointType extends Enumeration {
  val Core, Border, Outlier = Value
}

/** A clustering produced by any of the DBSCAN variants in this repo.
  *
  * @param labels cluster id per point; [[DBSCANResult.Noise]] (= -1) for outliers.
  *               Border points carry the id of *one* of their reachable
  *               clusters (Definition 1 footnote: assignment is ambiguous).
  * @param types  Core / Border / Outlier per point
  */
final case class DBSCANResult(labels: Array[Int], types: Array[PointType.Value]) {
  require(labels.length == types.length)

  def n: Int = labels.length
  def numClusters: Int = labels.filter(_ >= 0).distinct.length
  def coreIndices: IndexedSeq[Int] = labels.indices.filter(types(_) == PointType.Core)
  def outlierIndices: IndexedSeq[Int] = labels.indices.filter(types(_) == PointType.Outlier)

  /** Renumber cluster ids to 0..k-1 in first-appearance order (noise stays -1). */
  def normalized: DBSCANResult = {
    val map = scala.collection.mutable.HashMap.empty[Int, Int]
    val out = labels.map { l =>
      if (l < 0) DBSCANResult.Noise else map.getOrElseUpdate(l, map.size)
    }
    DBSCANResult(out, types)
  }
}

object DBSCANResult {
  val Noise: Int = -1
}
