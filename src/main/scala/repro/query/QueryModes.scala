package repro.query

import scala.util.Random
import org.apache.spark.sql.SparkSession
import repro.core.Labeling
import repro.graph.{Dijkstra, Ranking}

/** The three distributed query-serving modes of §6, on a `q`-node
  * simulated cluster (DESIGN.md §3: nodes = Spark partitions; network
  * latency is modelled with cluster-Ethernet constants while per-query
  * compute is actually measured).
  *
  *  - QLSN: every node stores all labels; a query is answered by the node
  *    where it emerges (no network, memory q× replicated).
  *  - QFDL: each vertex's labels are split across all nodes by hub owner;
  *    a query is broadcast, partial minima are MPI_MIN-allreduced.
  *  - QDOL: the vertex set is cut into ζ parts with ζ(ζ-1)/2 ≤ q; a node
  *    stores the full labels of one part-pair and answers its queries
  *    entirely, via point-to-point messages.
  */
object QueryModes {

  /** Modelled one-way network costs (µs): broadcast+allreduce round for
    * QFDL, P2P request+response round for QDOL (§6; see DESIGN.md §3).
    */
  val BroadcastRtMicros = 20.0
  val P2pRtMicros       = 6.0

  final case class ModeMetrics(
      mode: String,
      distances: Array[Long],
      throughputQps: Double,
      latencyMicros: Double,
      memBytesTotal: Long,
      memBytesMaxNode: Long,
  )

  /** Random query endpoints, deterministic in the seed. */
  def genQueries(n: Int, count: Int, seed: Long): (Array[Int], Array[Int]) = {
    val rnd = new Random(seed)
    (Array.fill(count)(rnd.nextInt(n)), Array.fill(count)(rnd.nextInt(n)))
  }

  /** ζ for a q-node cluster: the largest ζ with C(ζ,2) ≤ q (≥ 2). */
  def zeta(q: Int): Int = {
    var z = 2
    while ((z + 1).toLong * z / 2 <= q) z += 1
    z
  }

  // ---------------------------------------------------------------- QLSN
  def qlsn(spark: SparkSession, labeling: Labeling, q: Int,
           us: Array[Int], vs: Array[Int]): ModeMetrics = {
    val sc  = spark.sparkContext
    val bcL = sc.broadcast(labeling)
    val t0  = System.nanoTime()
    // one node answers the whole batch locally
    val res = sc.parallelize(us.indices, 1)
      .map { i => bcL.value.query(us(i), vs(i)) }
      .collect()
    val elapsed = (System.nanoTime() - t0) / 1e9
    val perQueryMicros = measureMergeMicros(labeling, us, vs)
    bcL.destroy()
    ModeMetrics("QLSN", res,
      throughputQps = us.length / elapsed,
      latencyMicros = perQueryMicros, // no network hop
      memBytesTotal = labeling.storageBytes * q,
      memBytesMaxNode = labeling.storageBytes)
  }

  // ---------------------------------------------------------------- QFDL
  def qfdl(spark: SparkSession, labeling: Labeling, rank: Ranking, q: Int,
           us: Array[Int], vs: Array[Int]): ModeMetrics = {
    val sc  = spark.sparkContext
    val bcL = sc.broadcast(labeling)
    val bcR = sc.broadcast(rank)
    val t0 = System.nanoTime()
    // every node scans the whole batch over its 1/q slice of each label
    // set (hubs it owns), then partial results are MIN-reduced
    val res = sc.parallelize(0 until q, q)
      .map { node =>
        val l = bcL.value; val r = bcR.value
        Array.tabulate(us.length)(i => partialQuery(l, r, q, node, us(i), vs(i)))
      }
      .treeReduce { (x, y) =>
        val out = new Array[Long](x.length)
        var i = 0
        while (i < x.length) { out(i) = math.min(x(i), y(i)); i += 1 }
        out
      }
    val elapsed = (System.nanoTime() - t0) / 1e9
    val perQueryMicros = measureMergeMicros(labeling, us, vs)
    // per-node label bytes by hub owner
    val perNodeBytes = Array.fill(q)(0L)
    labeling.triples.foreach(t => perNodeBytes(rank.owner(t.h, q)) += Labeling.BytesPerLabel)
    bcL.destroy(); bcR.destroy()
    ModeMetrics("QFDL", res,
      throughputQps = us.length / elapsed,
      // each node does ~1/q of the merge work, plus a broadcast+reduce round
      latencyMicros = perQueryMicros / q + BroadcastRtMicros,
      memBytesTotal = labeling.storageBytes,
      memBytesMaxNode = perNodeBytes.max)
  }

  /** Minimum over common hubs *owned by* `node` — QFDL's partial answer. */
  private def partialQuery(l: Labeling, rank: Ranking, q: Int, node: Int,
                           u: Int, v: Int): Long = {
    val hu = l.hubs(u); val du = l.dists(u)
    val hv = l.hubs(v); val dv = l.dists(v)
    var i = 0; var j = 0
    var best = Dijkstra.Inf
    while (i < hu.length && j < hv.length) {
      val ri = rank(hu(i)); val rj = rank(hv(j))
      if (ri == rj) {
        if (rank.owner(hu(i), q) == node) {
          val s = du(i) + dv(j)
          if (s < best) best = s
        }
        i += 1; j += 1
      } else if (ri > rj) i += 1
      else j += 1
    }
    best
  }

  // ---------------------------------------------------------------- QDOL
  def qdol(spark: SparkSession, labeling: Labeling, q: Int,
           us: Array[Int], vs: Array[Int]): ModeMetrics = {
    val sc = spark.sparkContext
    val z  = zeta(q)
    // node for an unordered part pair (p1 <= p2); same-part queries are
    // served by the node holding (p, (p+1) mod z)
    def pairNode(pu: Int, pv: Int): Int = {
      var (p1, p2) = if (pu <= pv) (pu, pv) else (pv, pu)
      if (p1 == p2) { p2 = (p1 + 1) % z; if (p2 < p1) { val t = p1; p1 = p2; p2 = t } }
      // index of pair (p1,p2) among all ordered pairs p1 < p2
      p1 * z - p1 * (p1 + 1) / 2 + (p2 - p1 - 1)
    }
    val bcL = sc.broadcast(labeling)
    val t0 = System.nanoTime()
    // queries are routed (sorted per node — the paper's footnote 9 — here:
    // groupBy node), each node answers its own with full label sets
    val byNode = us.indices.groupBy(i => pairNode(us(i) % z, vs(i) % z))
    val res = new Array[Long](us.length)
    sc.parallelize(byNode.toSeq, math.max(1, math.min(q, byNode.size)))
      .map { case (node, idxs) =>
        val l = bcL.value
        (idxs, idxs.map(i => l.query(us(i), vs(i))).toArray)
      }
      .collect()
      .foreach { case (idxs, ds) => idxs.indices.foreach(k => res(idxs(k)) = ds(k)) }
    val elapsed = (System.nanoTime() - t0) / 1e9
    val perQueryMicros = measureMergeMicros(labeling, us, vs)
    // per-node storage: full label sets of the node's two vertex parts
    val partBytes = Array.fill(z)(0L)
    (0 until labeling.n).foreach(v => partBytes(v % z) += labeling.hubs(v).length * Labeling.BytesPerLabel)
    val nodePairs = for (p1 <- 0 until z; p2 <- (p1 + 1) until z) yield (p1, p2)
    val perNodeBytes = nodePairs.map { case (p1, p2) => partBytes(p1) + partBytes(p2) }
    bcL.destroy()
    ModeMetrics("QDOL", res,
      throughputQps = us.length / elapsed,
      latencyMicros = perQueryMicros + P2pRtMicros,
      memBytesTotal = perNodeBytes.sum,
      memBytesMaxNode = perNodeBytes.max)
  }

  /** Measured single-thread full-merge time per query (µs), averaged over
    * a bounded probe prefix — the compute component of latency.
    */
  private def measureMergeMicros(l: Labeling, us: Array[Int], vs: Array[Int]): Double = {
    val probes = math.min(2000, us.length)
    var sink = 0L
    val t0 = System.nanoTime()
    var i = 0
    while (i < probes) { sink += l.query(us(i), vs(i)); i += 1 }
    val dt = (System.nanoTime() - t0) / 1e3 / probes
    if (sink == Long.MinValue) Console.err.println("unreachable") // keep sink live
    dt
  }
}
