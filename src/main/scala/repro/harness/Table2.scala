package repro.harness

/** Table 2 harness: dataset statistics — the paper's real graphs next to
  * our synthetic `*-lite` analogs (substitution documented in DESIGN.md §3).
  */
object Table2 {

  final case class Row(name: String, paperName: String, kind: String,
                       directedInPaper: Boolean, paperN: Long, paperM: Long,
                       n: Int, m: Long)

  def run(scale: Double): Seq[Row] =
    Datasets.all.map { spec =>
      val g = spec.graph(scale)
      Row(spec.name, spec.paperName, spec.kind, spec.directedInPaper,
        spec.paperN, spec.paperM, g.n, g.m)
    }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= f"${"Dataset"}%-10s ${"Paper"}%-6s ${"Type"}%-11s ${"paper n"}%10s ${"paper m"}%10s ${"our n"}%8s ${"our m"}%9s\n"
    rows.foreach { r =>
      sb ++= f"${r.name}%-10s ${r.paperName}%-6s ${r.kind}%-11s ${r.paperN}%10d ${r.paperM}%10d ${r.n}%8d ${r.m}%9d\n"
    }
    sb.result()
  }
}
