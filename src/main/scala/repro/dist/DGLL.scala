package repro.dist

import scala.collection.mutable
import org.apache.spark.sql.SparkSession
import repro.core._
import repro.graph.{CsrGraph, Ranking}

/** Distributed GLL (§5.1) and the DparaPLL baseline.
  *
  * The rank-ordered root queue is split circularly over `q` simulated
  * nodes. Supersteps grow geometrically by `beta` (the experiments
  * synchronize `log_beta(n)` times); at each synchronization the labels
  * generated in the superstep are broadcast to all nodes (metered), every
  * node answers the cleaning queries it can decide — a witness hub's
  * labels for both endpoints live on the hub's owner — and the redundancy
  * bitvectors are OR-allreduced.
  *
  * `rankQueries = false, clean = false, replicate = true` turns this into
  * DparaPLL: no rank pruning, every exchanged label kept and replicated on
  * every node.
  */
object DGLL {

  def run(
      spark: SparkSession,
      g: CsrGraph,
      rank: Ranking,
      q: Int,
      beta: Int = 8,
      rankQueries: Boolean = true,
      clean: Boolean = true,
      replicate: Boolean = false,
  ): (Labeling, DistStats) = {
    val sc  = spark.sparkContext
    val t0  = System.nanoTime()
    val acc = new SimCluster.StatsAccum
    val owned = runSupersteps(
      spark, g, rank, q, beta, rankQueries, clean,
      hc = null, startPos = 0, priorOwned = SimCluster.emptyLabels(sc, q), acc)
    val perNodeStored = SimCluster.perNodeLabelCounts(owned)
    val triples       = owned.map(_._2).collect()
    owned.unpersist(blocking = false)
    val labeling = Labeling.fromTriples(g.n, rank, triples.iterator)
    val perNode =
      if (replicate) Array.fill(q)(labeling.labelCount) // DparaPLL keeps all labels everywhere
      else perNodeStored
    (labeling, DistStats(
      timeMs = (System.nanoTime() - t0) / 1000000,
      syncs = acc.syncs,
      labelsGenerated = acc.labelsGenerated,
      labelsFinal = labeling.labelCount,
      redundantRemoved = acc.redundantRemoved,
      bytesBroadcast = acc.bytesBroadcast,
      bytesAllReduce = acc.bytesAllReduce,
      explored = acc.explored,
      perNodeLabels = perNode))
  }

  /** Geometrically growing superstep sizes covering `total` roots. */
  private[dist] def superstepSizes(total: Int, beta: Int): Seq[Int] = {
    if (total <= 0) return Nil
    val steps = math.max(1, math.ceil(math.log(math.max(2.0, total.toDouble)) / math.log(beta.toDouble)).toInt)
    val denom = (math.pow(beta.toDouble, steps.toDouble) - 1) / (beta - 1)
    val s0    = math.max(1.0, total / denom)
    val sizes = (0 until steps).map(k => math.max(1, math.round(s0 * math.pow(beta.toDouble, k.toDouble)).toInt))
    sizes
  }

  /** The superstep engine, reusable by Hybrid's post-switch phase.
    *
    * @param hc          optional Common Label Table consulted by distance
    *                    queries on every node (§5.3)
    * @param priorOwned  labels already stored per node (Hybrid's PLaNT
    *                    phase output); visible for pruning only to their
    *                    owner, and as cleaning witnesses to everyone via
    *                    the bitvector scheme
    * @return the final owned-label RDD (persisted)
    */
  private[dist] def runSupersteps(
      spark: SparkSession,
      g: CsrGraph,
      rank: Ranking,
      q: Int,
      beta: Int,
      rankQueries: Boolean,
      clean: Boolean,
      hc: CommonTable,
      startPos: Int,
      priorOwned: SimCluster.OwnedLabels,
      acc: SimCluster.StatsAccum,
  ): SimCluster.OwnedLabels = {
    val sc = spark.sparkContext
    val n  = g.n
    val bcGraph = sc.broadcast(g)
    val bcRank  = sc.broadcast(rank)
    val bcHc    = if (hc != null) sc.broadcast(hc) else null
    val exploredAcc = sc.longAccumulator("explored")

    var owned  = priorOwned
    // Global pruning table: labels exchanged so far in THIS phase (Hybrid's
    // pre-switch PLaNT labels are deliberately not here — they were never
    // broadcast; each node sees only its own slice of them).
    val globalTriples = mutable.ArrayBuffer.empty[LabelTriple]
    var gHubs  = Array.fill(n)(Array.emptyIntArray)
    var gDists = Array.fill(n)(Array.emptyLongArray)

    var pos = startPos
    val sizes = superstepSizes(n - startPos, beta).iterator
    while (pos < n) {
      val size = if (sizes.hasNext) sizes.next() else n - pos
      val a = pos
      val b = math.min(n, a + size)
      pos = b

      val bcGlobal = sc.broadcast((gHubs, gDists))
      val rq = rankQueries
      val newTriples: Array[LabelTriple] = owned
        .mapPartitionsWithIndex { (pid, it) =>
          val gg = bcGraph.value; val rk = bcRank.value
          val own = new LabelBuffers(gg.n, threadSafe = false)
          it.foreach { case (_, t) => own.add(t.v, t.h, t.d) }
          val local = new LabelBuffers(gg.n, threadSafe = false)
          val (gh, gd) = bcGlobal.value
          val views = mutable.ArrayBuffer[LabelView](
            new LabelView.OfLabeling(new Labeling(gg.n, gh, gd, rk)),
            new LabelView.OfBuffers(own),
            new LabelView.OfBuffers(local))
          if (bcHc != null) views += new HcView(bcHc.value, rk)
          val view    = new LabelView.Composite(views.toSeq)
          val scratch = new DijkstraScratch(gg.n)
          val out     = mutable.ArrayBuffer.empty[LabelTriple]
          var explored = 0L
          // process this node's slice of the superstep's roots in rank order
          var p = a
          while (p < b) {
            if (p % q == pid) {
              val root = rk.order(p)
              explored += PrunedDijkstra.buildTree(
                gg, rk, root, view, rq, scratch,
                sink = (v, d) => { local.add(v, root, d); out += LabelTriple(v, root, d) })
            }
            p += 1
          }
          exploredAcc.add(explored)
          out.iterator
        }
        .collect() // ← the superstep's label exchange (metered below)
      bcGlobal.destroy()
      acc.labelsGenerated += newTriples.length
      acc.recordExchange(newTriples.length.toLong, q, cleaned = clean)

      val survivors: Array[LabelTriple] =
        if (!clean || newTriples.isEmpty) newTriples
        else {
          val bits = cleanCandidates(spark, owned, q, bcRank, newTriples)
          acc.redundantRemoved += bits.count(identity)
          newTriples.zip(bits).collect { case (t, false) => t }
        }

      globalTriples ++= survivors
      val gl = Labeling.fromTriples(n, rank, globalTriples.iterator)
      gHubs = gl.hubs; gDists = gl.dists

      val next = SimCluster.appendLabels(sc, owned, q, rank, survivors.toIndexedSeq)
      next.persist()
      next.count()
      if (owned ne priorOwned) owned.unpersist(blocking = false)
      owned = next
    }
    acc.explored += exploredAcc.value
    bcGraph.destroy(); bcRank.destroy()
    if (bcHc != null) bcHc.destroy()
    owned
  }

  /** Distributed cleaning (§5.1): broadcast the superstep's candidate
    * labels; each node marks the candidates it can prove redundant using
    * witness hubs *it owns* (their labels for both endpoints live here);
    * OR-allreduce the bitvectors.
    */
  private def cleanCandidates(
      spark: SparkSession,
      owned: SimCluster.OwnedLabels,
      q: Int,
      bcRank: org.apache.spark.broadcast.Broadcast[Ranking],
      candidates: Array[LabelTriple],
  ): Array[Boolean] = {
    val sc     = spark.sparkContext
    val bcCand = sc.broadcast(candidates)
    val bits = owned
      .mapPartitionsWithIndex { (pid, it) =>
        val rk   = bcRank.value
        val cand = bcCand.value
        // vertex -> (hub -> dist) over labels whose hub this node owns:
        // prior owned labels plus this superstep's candidates owned here.
        val lab = new mutable.LongMap[mutable.LongMap[Long]]()
        def put(t: LabelTriple): Unit =
          lab.getOrElseUpdate(t.v.toLong, new mutable.LongMap[Long](8))(t.h.toLong) = t.d
        it.foreach { case (_, t) => put(t) }
        cand.foreach(t => if (rk.owner(t.h, q) == pid) put(t))
        val res = new Array[Boolean](cand.length)
        var ci = 0
        while (ci < cand.length) {
          val t  = cand(ci)
          val mv = lab.getOrNull(t.v.toLong)
          val mh = lab.getOrNull(t.h.toLong)
          if (mv != null && mh != null) {
            val (small, big) = if (mv.size <= mh.size) (mv, mh) else (mh, mv)
            val rh = rk(t.h)
            val found = small.exists { case (w, d1) =>
              rk(w.toInt) > rh && {
                val d2 = big.getOrElse(w, -1L)
                d2 >= 0 && d1 + d2 <= t.d
              }
            }
            if (found) res(ci) = true
          }
          ci += 1
        }
        Iterator.single(res)
      }
      .treeReduce { (x, y) =>
        val r = new Array[Boolean](x.length)
        var i = 0
        while (i < x.length) { r(i) = x(i) || y(i); i += 1 }
        r
      }
    bcCand.destroy()
    bits
  }
}

/** [[LabelView]] adapter for the Common Label Table: answers distance
  * queries directly from the replicated top-η hub labels.
  */
final class HcView(hc: CommonTable, rank: Ranking) extends LabelView {
  def appendRootSnapshot(root: Int, into: mutable.LongMap[Long]): Unit = ()
  def covered(v: Int, root: Int, rootMap: mutable.LongMap[Long], delta: Long): Boolean =
    hc.covered(v, root, delta, rank)
}
