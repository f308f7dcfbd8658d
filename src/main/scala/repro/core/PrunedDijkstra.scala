package repro.core

import scala.collection.mutable
import repro.graph.{CsrGraph, Dijkstra, LongMinHeap, Ranking}

/** Reusable per-thread scratch for repeated Dijkstra runs — footnote 2 of
  * the paper: initialization only touches elements modified by the previous
  * run.
  */
final class DijkstraScratch(n: Int) {
  val dist: Array[Long] = Array.fill(n)(Dijkstra.Inf)
  val anc: Array[Int]   = new Array[Int](n)       // PLaNT ancestor array
  val settled: Array[Boolean] = new Array[Boolean](n)
  val heap = new LongMinHeap(64)
  private val touched = new mutable.ArrayBuffer[Int](64)

  def touch(v: Int): Unit = touched += v

  def reset(): Unit = {
    var i = 0
    while (i < touched.length) {
      val v = touched(i)
      dist(v) = Dijkstra.Inf; settled(v) = false
      i += 1
    }
    touched.clear()
    heap.clear()
  }
}

/** Pruned Dijkstra with Rank Queries (Alg. 1) — the tree-construction
  * engine shared by seqPLL, SparaPLL, LCC, GLL and DGLL; they differ only
  * in what [[LabelView]] they can consult and whether rank queries are on.
  */
object PrunedDijkstra {

  /** Build the pruned SPT rooted at `root`.
    *
    * @param rankQueries prune (and withhold labels) at vertices ranked
    *                    above the root — LCC's crucial addition; paraPLL
    *                    runs with this off
    * @param view        tables consulted by distance queries; the root's
    *                    label set is snapshotted (hashed) once up front,
    *                    like paraPLL/PLL's `hash(L_h)`
    * @param sink        called with `(v, dist)` for every label generated
    * @return            number of vertices settled (explored)
    */
  def buildTree(
      g: CsrGraph,
      rank: Ranking,
      root: Int,
      view: LabelView,
      rankQueries: Boolean,
      scratch: DijkstraScratch,
      sink: (Int, Long) => Unit,
  ): Long = {
    scratch.reset()
    val dist = scratch.dist
    val heap = scratch.heap
    val rootMap = new mutable.LongMap[Long](64)
    view.appendRootSnapshot(root, rootMap)

    dist(root) = 0
    scratch.touch(root)
    heap.push(0, root)
    var explored = 0L

    while (heap.nonEmpty) {
      val d = heap.topDist; val v = heap.topVertex; heap.pop()
      if (d == dist(v) && !scratch.settled(v)) {
        scratch.settled(v) = true
        explored += 1
        val rankPruned = rankQueries && rank(v) > rank(root)
        if (!rankPruned && !view.covered(v, root, rootMap, d)) {
          sink(v, d)
          var e = g.offsets(v)
          while (e < g.offsets(v + 1)) {
            val u = g.nbrs(e); val nd = d + g.wts(e)
            if (nd < dist(u)) {
              if (dist(u) == Dijkstra.Inf) scratch.touch(u)
              dist(u) = nd
              heap.push(nd, u)
            }
            e += 1
          }
        }
      }
    }
    explored
  }
}
