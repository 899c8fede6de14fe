package repro.jobs

import repro.exp.Table1

/** spark-submit entrypoint for Table 1 (dataset inventory).
  * Usage: spark-submit --class repro.jobs.Table1Job repro.jar [scale]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    println(Table1.render(Table1.run(scale)))
  }
}
