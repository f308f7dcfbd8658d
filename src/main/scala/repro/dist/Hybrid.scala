package repro.dist

import scala.collection.mutable
import org.apache.spark.sql.SparkSession
import repro.core.{DijkstraScratch, Labeling, LabelTriple}
import repro.graph.{CsrGraph, Ranking}

/** PLaNT (§5.2) and the Hybrid PLaNT→DGLL algorithm (§5.2.1).
  *
  * Phase 1 plants trees batch-by-batch over the rank-ordered root queue —
  * an embarrassingly parallel `mapPartitions` over the circularly split
  * queue with **no** label traffic (the only broadcast is the optional
  * Common Label Table of the η top hubs). After each batch the driver
  * evaluates Ψ = vertices-explored / labels-generated; once Ψ exceeds
  * `psiTh` the run switches to DGLL supersteps (phase 2), which prune with
  * rank queries + the common table + post-switch exchanged labels and
  * clean against the full partitioned store.
  *
  * `psiTh = ∞, eta = 0` is pure PLaNT ([[Plant.run]]).
  */
object Hybrid {

  def run(
      spark: SparkSession,
      g: CsrGraph,
      rank: Ranking,
      q: Int,
      psiTh: Double = 100.0,
      eta: Int = 16,
      beta: Int = 8,
      batchSize: Int = 0,
  ): (Labeling, DistStats) = {
    val sc  = spark.sparkContext
    val n   = g.n
    val t0  = System.nanoTime()
    val acc = new SimCluster.StatsAccum
    val part = new SimCluster.NodePartitioner(q)
    // batch granularity trades Ψ-sampling resolution against per-batch job
    // overhead; n/16 keeps the switch decision responsive at our scales
    val batch = if (batchSize > 0) batchSize else math.max(4 * q, n / 16)
    val useHc = eta > 0

    val bcGraph = sc.broadcast(g)
    val bcRank  = sc.broadcast(rank)
    val exploredAcc = sc.longAccumulator("plantExplored")

    var owned: SimCluster.OwnedLabels = SimCluster.emptyLabels(sc, q)
    var hc: CommonTable = if (useHc) CommonTable.empty(math.min(eta, n), n) else null
    var pos       = 0
    var switchPos = -1
    var lastExplored = 0L

    while (pos < n && switchPos < 0) {
      val a = pos
      val b = math.min(n, a + batch)
      pos = b
      val bcHc = if (hc != null) sc.broadcast(hc) else null
      val batchRdd = sc
        .parallelize((a until b).map(p => (p % q, p)), q)
        .partitionBy(part)
        .mapPartitionsWithIndex { (pid, it) =>
          val gg = bcGraph.value; val rk = bcRank.value
          val hct = if (bcHc != null) bcHc.value else null
          val scratch = new DijkstraScratch(gg.n)
          val out = mutable.ArrayBuffer.empty[(Int, LabelTriple)]
          var explored = 0L
          it.foreach { case (_, p) =>
            val root = rk.order(p)
            explored += PlantTree.build(gg, rk, root, hct, scratch,
              sink = (v, d) => out += ((pid, LabelTriple(v, root, d))))
          }
          exploredAcc.add(explored)
          out.iterator
        }
      batchRdd.persist()
      val labelsThisBatch = batchRdd.count()
      acc.labelsGenerated += labelsThisBatch
      val exploredThisBatch = exploredAcc.value - lastExplored
      lastExplored = exploredAcc.value

      if (useHc) {
        val etaEff = math.min(eta, n)
        val hcNew = batchRdd.map(_._2).filter(t => bcRank.value.posOf(t.h) < etaEff).collect()
        if (hcNew.nonEmpty) {
          hc = hc.updated(rank, hcNew.toIndexedSeq)
          acc.recordCommonTable(hcNew.length.toLong, q)
        }
      }
      val next = owned.union(batchRdd).partitionBy(part)
      next.persist()
      next.count()
      owned.unpersist(blocking = false)
      batchRdd.unpersist(blocking = false)
      owned = next
      if (bcHc != null) bcHc.destroy()

      val psi = exploredThisBatch.toDouble / math.max(1L, labelsThisBatch)
      if (psi > psiTh && pos < n) switchPos = pos
    }
    acc.explored = lastExplored

    val finalOwned =
      if (switchPos >= 0)
        DGLL.runSupersteps(spark, g, rank, q, beta,
          rankQueries = true, clean = true, hc = hc,
          startPos = switchPos, priorOwned = owned, acc = acc)
      else owned

    val perNode = SimCluster.perNodeLabelCounts(finalOwned)
    val triples = finalOwned.map(_._2).collect()
    finalOwned.unpersist(blocking = false)
    bcGraph.destroy(); bcRank.destroy()
    val labeling = Labeling.fromTriples(n, rank, triples.iterator)
    (labeling, DistStats(
      timeMs = (System.nanoTime() - t0) / 1000000,
      syncs = acc.syncs,
      labelsGenerated = acc.labelsGenerated,
      labelsFinal = labeling.labelCount,
      redundantRemoved = acc.redundantRemoved,
      bytesBroadcast = acc.bytesBroadcast,
      bytesAllReduce = acc.bytesAllReduce,
      explored = acc.explored,
      perNodeLabels = perNode,
      switchPos = switchPos))
  }
}

/** Pure PLaNT: plant every tree, communicate nothing (§5.2). */
object Plant {
  def run(spark: SparkSession, g: CsrGraph, rank: Ranking, q: Int,
          batchSize: Int = 0): (Labeling, DistStats) =
    Hybrid.run(spark, g, rank, q, psiTh = Double.PositiveInfinity, eta = 0,
      batchSize = if (batchSize > 0) batchSize else math.max(1, g.n))
}
