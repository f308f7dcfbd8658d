package repro.dist

import repro.{SparkSpec, TestUtil}
import repro.core.{DijkstraScratch, SeqPLL}
import repro.graph.{GraphGen, Ranking}

class PlantSpec extends SparkSpec {

  for (seed <- 1 to 16)
    test(s"PLaNT outputs the canonical labeling (seed=$seed)") {
      val (g, _) = TestUtil.graphFor(seed)
      val r      = TestUtil.rankingFor(g, seed)
      val (l, stats) = Plant.run(spark, g, r, q = 1 + seed % 4)
      TestUtil.assertCanonical(l, g, r)
      TestUtil.assertCover(l, g)
      assert(stats.redundantRemoved == 0, "PLaNT must not need cleaning")
    }

  test("PLaNT communicates zero label bytes") {
    val g = GraphGen.preferentialAttachment(60, 3, seed = 41)
    val r = Ranking.byDegree(g)
    val (_, stats) = Plant.run(spark, g, r, q = 4)
    assert(stats.bytesBroadcast == 0 && stats.bytesAllReduce == 0 && stats.syncs == 0)
  }

  for (q <- Seq(1, 2, 4, 8))
    test(s"PLaNT labeling is identical for q=$q") {
      val g = GraphGen.grid(6, 6, seed = 42)
      val r = Ranking.byApproxBetweenness(g)
      val (l, _) = Plant.run(spark, g, r, q)
      assert(l.tripleSet == SeqPLL.run(g, r).labeling.tripleSet)
    }

  test("label partitioning: every node stores only hubs it owns") {
    val g = GraphGen.preferentialAttachment(80, 3, seed = 43)
    val r = Ranking.byDegree(g)
    val q = 4
    val (l, stats) = Plant.run(spark, g, r, q)
    assert(stats.perNodeLabels.length == q)
    assert(stats.perNodeLabels.sum == l.labelCount)
    // circular split keeps nodes roughly balanced on this skew-free count
    assert(stats.perNodeLabels.forall(_ > 0))
  }

  test("PLaNT explores at least as much as PLL (no tree pruning)") {
    val g = GraphGen.grid(7, 7, seed = 44)
    val r = Ranking.byApproxBetweenness(g)
    val seq = SeqPLL.run(g, r)
    val (_, stats) = Plant.run(spark, g, r, q = 2)
    assert(stats.explored >= seq.explored,
      s"PLaNT explored ${stats.explored} < PLL ${seq.explored}")
  }

  test("early termination: low-ranked roots do not explore the full graph") {
    // a path graph ranked left-to-right: the lowest-ranked root's tree must
    // stop as soon as all frontier ancestors outrank it
    val n = 50
    val g = repro.graph.CsrGraph.fromEdges(n, (0 until n - 1).map(i => (i, i + 1, 1)))
    val r = Ranking.identity(n)
    val scratch = new DijkstraScratch(n)
    var labels = 0
    val explored = PlantTree.build(g, r, root = 0, hc = null, scratch, (_, _) => labels += 1)
    // root 0 is the global minimum rank: only its self label, and the tree
    // terminates after visiting its frontier (not all 50 vertices)
    assert(labels == 1)
    assert(explored < n, s"explored $explored of $n — early termination failed")
  }

  test("PlantTree picks the highest-ranked ancestor among tied paths") {
    // two equal-length 0→3 paths via 1 (rank high) and 2 (rank low);
    // tree rooted at 3 must see ancestor 1 for vertex 0 — vertices are
    // ranked 3 > 1 > 2 > 0 so hub 3 labels 0 regardless, but hub 1's own
    // redundancy logic is what the reference comparison pins down
    val g = repro.graph.CsrGraph.fromEdges(4, Seq((0, 1, 1), (1, 3, 1), (0, 2, 1), (2, 3, 1)))
    val r = new Ranking(Array(0, 2, 1, 3)) // rank: v3=3, v1=2, v2=1, v0=0
    val (l, _) = Plant.run(spark, g, r, q = 1)
    TestUtil.assertCanonical(l, g, r)
  }

  test("batched planting matches single-batch planting") {
    val g = GraphGen.preferentialAttachment(70, 3, seed = 45)
    val r = Ranking.byDegree(g)
    val (a, _) = Plant.run(spark, g, r, q = 3, batchSize = 7)
    val (b, _) = Plant.run(spark, g, r, q = 3)
    assert(a.tripleSet == b.tripleSet)
  }
}
