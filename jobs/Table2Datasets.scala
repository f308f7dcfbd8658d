package repro.jobs

import repro.harness.Table2

/** spark-submit entrypoint reproducing Table 2 (dataset statistics).
  * Usage: Table2Datasets [scale]
  */
object Table2Datasets {
  def main(args: Array[String]): Unit = {
    val scale = if (args.nonEmpty) args(0).toDouble else 1.0
    println(s"== Table 2 (dataset analogs, scale=$scale) ==")
    println(Table2.format(Table2.run(scale)))
  }
}
