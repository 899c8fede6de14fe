package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.EuclideanMetric
import repro.data.Datasets
import repro.spark.DistributedApproxDBSCAN

/** spark-submit entrypoint for the distributed (RDD map/reduce) approximate
  * DBSCAN on the moons dataset — demonstrates the cluster path end to end
  * and prints the per-cluster histogram via Spark SQL.
  * Usage: --class repro.jobs.DistributedApproxJob repro.jar [n] [rho]
  */
object DistributedApproxJob {
  def main(args: Array[String]): Unit = {
    val n   = args.headOption.map(_.toInt).getOrElse(20000)
    val rho = args.lift(1).map(_.toDouble).getOrElse(0.5)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("DistributedApproxDBSCAN")
      .getOrCreate()
    try {
      val ds  = Datasets.moons(n)
      val eps = Datasets.suggestEps(ds, minPts = 10)
      val rdd = spark.sparkContext.parallelize(
        ds.points.zipWithIndex.map { case (p, i) => (i.toLong, p) }, 16)
      val out = DistributedApproxDBSCAN.run(spark, rdd, EuclideanMetric, eps, 10, rho)
      println(s"n=$n eps=$eps rho=$rho -> |E|=${out.numCenters} |S*|=${out.summarySize}")
      out.labeled.createOrReplaceTempView("labeled")
      spark.sql(
        "SELECT label, COUNT(*) AS size FROM labeled GROUP BY label ORDER BY size DESC"
      ).show(20, truncate = false)
    } finally spark.stop()
  }
}
