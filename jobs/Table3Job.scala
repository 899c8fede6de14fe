package repro.jobs

import repro.exp.Table3

/** spark-submit entrypoint for Table 3 (ARI/AMI vs non-DBSCAN baselines).
  * Usage: --class repro.jobs.Table3Job repro.jar [scale]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    println(Table3.render(Table3.run(scale)))
  }
}
