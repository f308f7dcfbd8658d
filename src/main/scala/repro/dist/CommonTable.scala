package repro.dist

import repro.core.LabelTriple
import repro.graph.{Dijkstra, Ranking}

/** Common Label Table (§5.3): the complete label sets of the `eta`
  * most-important hubs, replicated on every node.
  *
  * Row `i` holds the distances labelled by the hub at rank position `i`
  * (`rank.order(i)`), `Inf` where that hub labels nothing. Because trees
  * are built in rank order and a hub's labels come only from its own tree,
  * the table is complete for every hub whose tree has finished — the
  * precondition for safe pruning ("if a node prunes using H_u it must have
  * H_v for all R(v) ≥ R(u)").
  *
  * Instances are immutable (updates return a structurally-shared copy) so
  * that re-broadcasting after each batch is safe in local mode.
  */
final class CommonTable private (
    val eta: Int,
    val n: Int,
    private val dist: Array[Array[Long]],
) extends Serializable {

  /** Distance labelled by top-hub `i` at `v`, or `Inf` if no such label. */
  def distOf(i: Int, v: Int): Long = dist(i)(v)

  /** Number of labels stored. */
  def labelCount: Long = {
    var s = 0L; var i = 0
    while (i < eta) {
      var v = 0
      while (v < n) { if (dist(i)(v) < Dijkstra.Inf) s += 1; v += 1 }
      i += 1
    }
    s
  }

  /** Distance query against the common table: is `SP(root, v) <= delta`
    * covered by a common hub that outranks `root`?
    */
  def covered(v: Int, root: Int, delta: Long, rank: Ranking): Boolean = {
    val lim = math.min(eta, rank.posOf(root)) // only hubs strictly above root
    var i = 0
    while (i < lim) {
      val dv = dist(i)(v)
      if (dv < Dijkstra.Inf) {
        val dr = dist(i)(root)
        if (dr < Dijkstra.Inf && dv + dr <= delta) return true
      }
      i += 1
    }
    false
  }

  /** New table with `labels` (whose hubs must be within the top `eta`)
    * added; rows untouched by `labels` are shared with this instance.
    */
  def updated(rank: Ranking, labels: Iterable[LabelTriple]): CommonTable = {
    val nd = dist.clone()
    val copied = new Array[Boolean](eta)
    labels.foreach { t =>
      val i = rank.posOf(t.h)
      require(i < eta, s"hub ${t.h} (pos $i) outside top $eta")
      if (!copied(i)) { nd(i) = nd(i).clone(); copied(i) = true }
      nd(i)(t.v) = t.d
    }
    new CommonTable(eta, n, nd)
  }
}

object CommonTable {
  def empty(eta: Int, n: Int): CommonTable =
    new CommonTable(eta, n, Array.fill(eta)(Array.fill(n)(Dijkstra.Inf)))
}
