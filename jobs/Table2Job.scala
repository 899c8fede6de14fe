package repro.jobs

import repro.exp.Table2

/** spark-submit entrypoint for Table 2 (runtime proportion of Algorithm 1
  * inside exact DBSCAN). Usage: --class repro.jobs.Table2Job repro.jar [scale]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    println(Table2.render(Table2.run(scale)))
  }
}
