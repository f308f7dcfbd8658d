package repro.dist

import org.apache.spark.{Partitioner, SparkContext}
import org.apache.spark.rdd.RDD
import repro.core.LabelTriple
import repro.graph.Ranking

/** The multi-node cluster substrate (DESIGN.md §3/§4).
  *
  * A cluster of `q` nodes is simulated as `q` Spark RDD partitions: labels
  * are hash-partitioned by *hub owner* (`owner(h) = posOf(h) mod q`, the
  * paper's circular task split), broadcasts are `sc.broadcast`, allreduce
  * is `treeReduce`, and communication volume is metered in bytes by the
  * driver using the paper's 12-byte-per-label accounting.
  */
object SimCluster {

  /** Keys are owner node ids already in `[0, q)`. */
  final class NodePartitioner(q: Int) extends Partitioner {
    def numPartitions: Int = q
    def getPartition(key: Any): Int = key.asInstanceOf[Int] % q
  }

  type OwnedLabels = RDD[(Int, LabelTriple)]

  def emptyLabels(sc: SparkContext, q: Int): OwnedLabels =
    sc.parallelize(Seq.empty[(Int, LabelTriple)], q).partitionBy(new NodePartitioner(q))

  /** Append freshly generated labels to the partitioned label store. */
  def appendLabels(sc: SparkContext, owned: OwnedLabels, q: Int,
                   rank: Ranking, fresh: Seq[LabelTriple]): OwnedLabels = {
    val freshRdd = sc.parallelize(fresh.map(t => (rank.owner(t.h, q), t)), math.max(1, q))
    owned.union(freshRdd).partitionBy(new NodePartitioner(q))
  }

  /** Labels stored per node — the collaborative-partitioning memory story. */
  def perNodeLabelCounts(owned: OwnedLabels): Array[Long] =
    owned.mapPartitions(it => Iterator.single(it.size.toLong)).collect()

  /** Mutable driver-side tally of the simulated cluster's behaviour. */
  final class StatsAccum {
    var syncs: Int              = 0
    var labelsGenerated: Long   = 0 // pre-clean
    var redundantRemoved: Long  = 0
    var bytesBroadcast: Long    = 0 // label exchange + common-table traffic
    var bytesAllReduce: Long    = 0 // cleaning bitvectors
    var explored: Long          = 0 // vertices settled across all SPTs

    /** One superstep's label exchange: every node receives all labels it
      * did not generate (`size * 12 * (q-1)` bytes), plus for cleaning two
      * bitvector movements per node.
      */
    def recordExchange(labels: Long, q: Int, cleaned: Boolean): Unit = {
      bytesBroadcast += labels * repro.core.Labeling.BytesPerLabel * math.max(0, q - 1)
      if (cleaned) bytesAllReduce += ((labels + 7) / 8) * 2 * q
      syncs += 1
    }

    def recordCommonTable(labels: Long, q: Int): Unit =
      bytesBroadcast += labels * repro.core.Labeling.BytesPerLabel * math.max(0, q - 1)
  }
}

/** Result of a distributed labeling run. */
final case class DistStats(
    timeMs: Long,
    syncs: Int,
    labelsGenerated: Long,
    labelsFinal: Long,
    redundantRemoved: Long,
    bytesBroadcast: Long,
    bytesAllReduce: Long,
    explored: Long,
    perNodeLabels: Array[Long],
    switchPos: Int = -1, // Hybrid: rank position of the PLaNT→DGLL switch
) {
  /** Ψ of the whole run: vertices explored per label generated. */
  def psi: Double = explored.toDouble / math.max(1L, labelsGenerated)
}
