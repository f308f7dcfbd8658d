package repro.dist

import repro.SparkSpec
import repro.core.LabelTriple
import repro.graph.Ranking

class SimClusterSpec extends SparkSpec {

  test("emptyLabels has q empty partitions") {
    val rdd = SimCluster.emptyLabels(spark.sparkContext, 4)
    assert(rdd.getNumPartitions == 4)
    assert(rdd.count() == 0)
  }

  test("appendLabels routes every label to its hub's owner partition") {
    val q    = 4
    val rank = Ranking.identity(8)
    val ts   = (0 until 8).map(h => LabelTriple(v = 0, h = h, d = h.toLong))
    val rdd = SimCluster.appendLabels(
      spark.sparkContext, SimCluster.emptyLabels(spark.sparkContext, q), q, rank, ts)
    val placed = rdd
      .mapPartitionsWithIndex((pid, it) => it.map { case (_, t) => (pid, t.h) })
      .collect()
    placed.foreach { case (pid, h) => assert(pid == rank.owner(h, q), s"hub $h on node $pid") }
    assert(placed.length == 8)
  }

  test("perNodeLabelCounts sums to the total") {
    val q    = 3
    val rank = Ranking.identity(9)
    val ts   = (0 until 9).flatMap(h => Seq(LabelTriple(1, h, 1), LabelTriple(2, h, 2)))
    val rdd = SimCluster.appendLabels(
      spark.sparkContext, SimCluster.emptyLabels(spark.sparkContext, q), q, rank, ts)
    val counts = SimCluster.perNodeLabelCounts(rdd)
    assert(counts.length == q)
    assert(counts.sum == 18)
  }

  test("recordExchange meters broadcast and bitvector traffic") {
    val acc = new SimCluster.StatsAccum
    acc.recordExchange(labels = 100, q = 4, cleaned = true)
    assert(acc.bytesBroadcast == 100L * 12 * 3)
    assert(acc.bytesAllReduce == 13L * 2 * 4)
    assert(acc.syncs == 1)
    acc.recordExchange(labels = 10, q = 4, cleaned = false)
    assert(acc.syncs == 2)
    assert(acc.bytesAllReduce == 13L * 2 * 4) // unchanged without cleaning
  }

  test("recordExchange on a single node moves no label bytes") {
    val acc = new SimCluster.StatsAccum
    acc.recordExchange(labels = 50, q = 1, cleaned = true)
    assert(acc.bytesBroadcast == 0)
  }

  test("recordCommonTable accounts the eta-hub replication") {
    val acc = new SimCluster.StatsAccum
    acc.recordCommonTable(labels = 7, q = 5)
    assert(acc.bytesBroadcast == 7L * 12 * 4)
  }

  test("NodePartitioner maps owner keys to themselves") {
    val p = new SimCluster.NodePartitioner(5)
    (0 until 5).foreach(i => assert(p.getPartition(i) == i))
    assert(p.numPartitions == 5)
  }
}
