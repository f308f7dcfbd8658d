package repro.jobs

import repro.harness.Table3

/** spark-submit entrypoint reproducing Table 3 (shared-memory ALS + time).
  * Usage: Table3SharedMemory [scale] [threads] [alpha]
  */
object Table3SharedMemory {
  def main(args: Array[String]): Unit = {
    val scale   = if (args.length > 0) args(0).toDouble else 1.0
    val threads = if (args.length > 1) args(1).toInt else Runtime.getRuntime.availableProcessors()
    val alpha   = if (args.length > 2) args(2).toDouble else 4.0
    println(s"== Table 3 (scale=$scale threads=$threads alpha=$alpha) ==")
    println(Table3.format(Table3.run(scale, threads, alpha)))
  }
}
