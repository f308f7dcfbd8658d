package repro.harness

import org.apache.spark.sql.SparkSession
import repro.core.GLL
import repro.query.QueryModes

/** Table 4 harness: query throughput / latency / label-storage memory for
  * QLSN, QFDL and QDOL on a 16-node simulated cluster, over the CHL of
  * each dataset (built with GLL — same labeling every algorithm emits).
  */
object Table4 {

  final case class Row(
      dataset: String,
      qlsn: QueryModes.ModeMetrics,
      qfdl: QueryModes.ModeMetrics,
      qdol: QueryModes.ModeMetrics,
  )

  def runOne(spark: SparkSession, spec: DatasetSpec, scale: Double, q: Int,
             batch: Int, threads: Int): Row = {
    val g    = spec.graph(scale)
    val rank = spec.ranking(g)
    val labeling = GLL.run(g, rank, threads).labeling
    val (us, vs) = QueryModes.genQueries(g.n, batch, seed = 42)
    val qlsn = QueryModes.qlsn(spark, labeling, q, us, vs)
    val qfdl = QueryModes.qfdl(spark, labeling, rank, q, us, vs)
    val qdol = QueryModes.qdol(spark, labeling, q, us, vs)
    require(qlsn.distances.sameElements(qfdl.distances) && qlsn.distances.sameElements(qdol.distances),
      s"query modes disagree on ${spec.name}")
    Row(spec.name, qlsn, qfdl, qdol)
  }

  def run(spark: SparkSession, scale: Double, q: Int, batch: Int, threads: Int,
          names: Seq[String] = Datasets.all.map(_.name)): Seq[Row] =
    names.map { n =>
      val row = runOne(spark, Datasets.byName(n), scale, q, batch, threads)
      Console.err.println(s"[table4] done $n")
      row
    }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= f"${"Dataset"}%-10s | ${"Thrpt (k q/s)"}%-26s | ${"Latency (us/query)"}%-26s | ${"Label memory (MB)"}%-26s\n"
    sb ++= f"${""}%-10s | ${"QLSN"}%8s ${"QFDL"}%8s ${"QDOL"}%8s | ${"QLSN"}%8s ${"QFDL"}%8s ${"QDOL"}%8s | ${"QLSN"}%8s ${"QFDL"}%8s ${"QDOL"}%8s\n"
    rows.foreach { r =>
      def kqps(m: QueryModes.ModeMetrics) = m.throughputQps / 1e3
      def mb(m: QueryModes.ModeMetrics)   = m.memBytesTotal / 1e6
      sb ++= f"${r.dataset}%-10s | ${kqps(r.qlsn)}%8.1f ${kqps(r.qfdl)}%8.1f ${kqps(r.qdol)}%8.1f" +
        f" | ${r.qlsn.latencyMicros}%8.2f ${r.qfdl.latencyMicros}%8.2f ${r.qdol.latencyMicros}%8.2f" +
        f" | ${mb(r.qlsn)}%8.2f ${mb(r.qfdl)}%8.2f ${mb(r.qdol)}%8.2f\n"
    }
    sb.result()
  }
}
