package repro.graph

/** A network hierarchy: a total order on vertices.
  *
  * `rankOf(v)` is the rank value (higher = more important);
  * `order(i)` is the vertex at position `i` from the top, so
  * `rankOf(order(0))` is the maximum. Ranks are a permutation of
  * `0 until n` (ties broken by vertex id at construction time), which the
  * canonical-labeling proofs require.
  */
final class Ranking(val rankOf: Array[Int]) extends Serializable {
  val n: Int = rankOf.length
  require(rankOf.sorted.sameElements(0 until n), "rankOf must be a permutation of 0..n-1")

  /** Vertices from most to least important. */
  val order: Array[Int] = {
    val o = new Array[Int](n)
    var v = 0
    while (v < n) { o(n - 1 - rankOf(v)) = v; v += 1 }
    o
  }

  def apply(v: Int): Int = rankOf(v)

  /** Position from the top of the hierarchy (0 = most important). */
  def posOf(v: Int): Int = n - 1 - rankOf(v)

  /** Cluster node owning vertex `v`'s tree under the paper's circular task
    * split: `TQ_i = { v | pos(v) mod q = i }` (§5.1).
    */
  def owner(v: Int, q: Int): Int = posOf(v) % q

  /** True iff `v` is one of the `eta` most important vertices. */
  def inTop(v: Int, eta: Int): Boolean = posOf(v) < eta
}

object Ranking {

  /** Rank by a score, ties broken by smaller vertex id ranking higher —
    * yields a strict total order as the algorithms require.
    */
  def byScore(scores: Array[Double]): Ranking = {
    val n     = scores.length
    val order = (0 until n).sortBy(v => (-scores(v), v)).toArray
    val rank  = new Array[Int](n)
    var i = 0
    while (i < n) { rank(order(i)) = n - 1 - i; i += 1 }
    new Ranking(rank)
  }

  /** Degree ranking — the paper's hierarchy for scale-free graphs (§7.1.1). */
  def byDegree(g: CsrGraph): Ranking =
    byScore(Array.tabulate(g.n)(v => g.degree(v).toDouble))

  /** Sampled-Brandes approximate betweenness — the paper's hierarchy for
    * road networks (§7.1.1): run Dijkstra from `samples` sources and
    * accumulate path dependencies.
    */
  def byApproxBetweenness(g: CsrGraph, samples: Int = 16, seed: Long = 17): Ranking = {
    val n     = g.n
    val score = new Array[Double](n)
    val rnd   = new scala.util.Random(seed)
    val sources = if (n <= samples) (0 until n).toArray else Array.fill(samples)(rnd.nextInt(n))
    for (s <- sources) {
      val dist  = Array.fill[Long](n)(Dijkstra.Inf)
      val sigma = new Array[Double](n)
      val preds = Array.fill(n)(List.empty[Int])
      val heap  = new LongMinHeap(64)
      val settledOrder = new scala.collection.mutable.ArrayBuffer[Int]
      dist(s) = 0; sigma(s) = 1.0; heap.push(0, s)
      while (heap.nonEmpty) {
        val d = heap.topDist; val v = heap.topVertex; heap.pop()
        if (d == dist(v)) {
          settledOrder += v
          var e = g.offsets(v)
          while (e < g.offsets(v + 1)) {
            val u = g.nbrs(e); val nd = d + g.wts(e)
            if (nd < dist(u)) {
              dist(u) = nd; sigma(u) = sigma(v); preds(u) = List(v); heap.push(nd, u)
            } else if (nd == dist(u)) {
              sigma(u) += sigma(v); preds(u) ::= v
            }
            e += 1
          }
        }
      }
      val delta = new Array[Double](n)
      var i = settledOrder.length - 1
      while (i >= 0) {
        val w = settledOrder(i)
        for (p <- preds(w)) delta(p) += sigma(p) / sigma(w) * (1.0 + delta(w))
        if (w != s) score(w) += delta(w)
        i -= 1
      }
    }
    byScore(score)
  }

  /** Identity ranking (vertex id = rank) for deterministic unit tests. */
  def identity(n: Int): Ranking = new Ranking(Array.tabulate(n)(v => v))

  /** Random permutation ranking for property tests. */
  def random(n: Int, seed: Long): Ranking = {
    val perm = new scala.util.Random(seed).shuffle((0 until n).toVector).toArray
    new Ranking(perm)
  }
}
