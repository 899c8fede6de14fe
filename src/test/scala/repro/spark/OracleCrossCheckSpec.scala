package repro.spark

import repro.{Oracle, SparkSpec}
import repro.core.{EuclideanMetric, ExactDBSCAN, PointType, TestUtil}

/** Cross-checks DBSCAN's primitive (ε-neighborhood counting / core flags)
  * expressed as SQL: Spark (Catalyst) vs DuckDB via the oracle, and both vs
  * the algorithmic core-point labels of ExactDBSCAN. A broken distance or
  * counting path fails here even if the clustering "ran".
  */
class OracleCrossCheckSpec extends SparkSpec {
  import TestUtil._

  private val eps    = 1.0
  private val minPts = 5

  private def pointsDF(pts: IndexedSeq[Vec]) = {
    import spark.implicits._
    pts.zipWithIndex.map { case (p, i) => (i.toLong, p(0), p(1)) }.toDF("id", "x", "y")
  }

  private val coreSql =
    s"""SELECT a.id AS id,
       |       CASE WHEN COUNT(*) >= $minPts THEN 1 ELSE 0 END AS is_core
       |FROM pts a JOIN pts b
       |  ON (CAST(a.x AS DOUBLE) - CAST(b.x AS DOUBLE)) * (CAST(a.x AS DOUBLE) - CAST(b.x AS DOUBLE))
       |   + (CAST(a.y AS DOUBLE) - CAST(b.y AS DOUBLE)) * (CAST(a.y AS DOUBLE) - CAST(b.y AS DOUBLE))
       |  <= ${eps * eps}
       |GROUP BY a.id""".stripMargin

  test("core-point flags: Spark SQL == DuckDB (oracle)") {
    val pts = blobs(150, 2, 2, outliers = 10, seed = 231)
    val df  = pointsDF(pts)
    df.createOrReplaceTempView("pts")
    val sparkRes = spark.sql(coreSql)
    Oracle.assertEquivalent(sparkRes, coreSql, "pts" -> df)
  }

  test("core-point flags from SQL == ExactDBSCAN's step-1 labels") {
    val pts = blobs(180, 2, 3, outliers = 12, seed = 232)
    val df  = pointsDF(pts)
    df.createOrReplaceTempView("pts")
    val sqlCore = spark.sql(coreSql).collect()
      .map(r => r.getLong(0).toInt -> (r.getInt(1) == 1)).toMap
    val algo = ExactDBSCAN.run(pts, EuclideanMetric, eps, minPts).result
    pts.indices.foreach { i =>
      assert(sqlCore(i) == (algo.types(i) == PointType.Core),
        s"core flag mismatch at $i: sql=${sqlCore(i)} algo=${algo.types(i)}")
    }
  }

  test("ε-neighborhood counts: Spark SQL == DuckDB (oracle)") {
    val pts = blobs(120, 2, 2, seed = 233)
    val df  = pointsDF(pts)
    df.createOrReplaceTempView("pts")
    val sql =
      s"""SELECT a.id AS id, COUNT(*) AS neighbors
         |FROM pts a JOIN pts b
         |  ON (CAST(a.x AS DOUBLE) - CAST(b.x AS DOUBLE)) * (CAST(a.x AS DOUBLE) - CAST(b.x AS DOUBLE))
         |   + (CAST(a.y AS DOUBLE) - CAST(b.y AS DOUBLE)) * (CAST(a.y AS DOUBLE) - CAST(b.y AS DOUBLE))
         |  <= ${eps * eps}
         |GROUP BY a.id""".stripMargin
    Oracle.assertEquivalent(spark.sql(sql), sql, "pts" -> df)
  }
}
