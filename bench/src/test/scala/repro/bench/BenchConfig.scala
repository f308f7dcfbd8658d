package repro.bench

/** Bench-wide knobs, overridable via environment for quick smoke runs. */
object BenchConfig {
  /** 1.0 ≈ the ~100 MB-class workload (SF=0.1 analog); tests use ≤0.1. */
  val scale: Double = sys.env.getOrElse("REPRO_BENCH_SCALE", "1.0").toDouble
  val threads: Int  = Runtime.getRuntime.availableProcessors()
  val q: Int        = sys.env.getOrElse("REPRO_BENCH_Q", "16").toInt
  val queryBatch: Int = sys.env.getOrElse("REPRO_BENCH_QUERIES", "200000").toInt

  def banner(name: String): Unit =
    println(s"\n===== $name (scale=$scale, threads=$threads) =====")
}
