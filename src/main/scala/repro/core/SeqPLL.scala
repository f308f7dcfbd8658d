package repro.core

import repro.graph.{CsrGraph, Ranking}

/** Sequential Pruned Landmark Labeling (Akiba et al.), with rank queries —
  * the paper's seqPLL baseline. Processes roots strictly in rank order, so
  * its output is exactly the Canonical Hub Labeling for `(G, R)`.
  */
object SeqPLL {

  final case class Result(labeling: Labeling, timeMs: Long, explored: Long)

  def run(g: CsrGraph, rank: Ranking): Result = {
    val t0      = System.nanoTime()
    val buffers = new LabelBuffers(g.n, threadSafe = false)
    val view    = new LabelView.OfBuffers(buffers)
    val scratch = new DijkstraScratch(g.n)
    var explored = 0L
    var i = 0
    while (i < g.n) {
      val root = rank.order(i)
      explored += PrunedDijkstra.buildTree(
        g, rank, root, view, rankQueries = true, scratch,
        sink = (v, d) => buffers.add(v, root, d))
      i += 1
    }
    val labeling = Labeling.fromTriples(g.n, rank, buffers.triples)
    Result(labeling, (System.nanoTime() - t0) / 1000000, explored)
  }
}
