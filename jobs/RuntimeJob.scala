package repro.jobs

import repro.exp.{Fig3Runtime, Fig6Memory}

/** spark-submit entrypoint for the Figure-3-shaped runtime comparison and
  * the Figure-6-shaped streaming memory table.
  * Usage: --class repro.jobs.RuntimeJob repro.jar [scale]
  */
object RuntimeJob {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    println(Fig3Runtime.render(Fig3Runtime.run(scale)))
    println()
    println(Fig6Memory.render(Fig6Memory.run(scale)))
  }
}
