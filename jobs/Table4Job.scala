package repro.jobs

import repro.exp.Table4

/** spark-submit entrypoint for Table 4 (streaming ARI/AMI comparison).
  * Usage: --class repro.jobs.Table4Job repro.jar [scale]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    println(Table4.render(Table4.run(scale)))
  }
}
