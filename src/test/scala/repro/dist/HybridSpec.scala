package repro.dist

import repro.{SparkSpec, TestUtil}
import repro.core.SeqPLL
import repro.graph.{GraphGen, Ranking}

class HybridSpec extends SparkSpec {

  for (seed <- 1 to 12)
    test(s"Hybrid outputs the canonical labeling (seed=$seed)") {
      val (g, _) = TestUtil.graphFor(seed)
      val r      = TestUtil.rankingFor(g, seed)
      val (l, _) = Hybrid.run(spark, g, r, q = 1 + seed % 4, psiTh = 3.0, batchSize = 11)
      TestUtil.assertCanonical(l, g, r)
      TestUtil.assertCover(l, g)
    }

  for (psiTh <- Seq(0.5, 2.0, 10.0, 1000.0))
    test(s"Hybrid canonical for switching threshold psiTh=$psiTh") {
      val g = GraphGen.preferentialAttachment(80, 3, seed = 61)
      val r = Ranking.byDegree(g)
      val (l, _) = Hybrid.run(spark, g, r, q = 4, psiTh = psiTh, batchSize = 13)
      assert(l.tripleSet == SeqPLL.run(g, r).labeling.tripleSet)
    }

  for (eta <- Seq(0, 1, 4, 16, 64))
    test(s"Hybrid canonical with common-table eta=$eta") {
      val g = GraphGen.grid(6, 6, seed = 62)
      val r = Ranking.byApproxBetweenness(g)
      val (l, _) = Hybrid.run(spark, g, r, q = 3, psiTh = 2.0, eta = eta, batchSize = 9)
      TestUtil.assertCanonical(l, g, r)
    }

  test("a tiny psiTh forces an early switch to DGLL") {
    val g = GraphGen.grid(7, 7, seed = 63)
    val r = Ranking.byApproxBetweenness(g)
    val (_, stats) = Hybrid.run(spark, g, r, q = 2, psiTh = 0.0, batchSize = 8)
    assert(stats.switchPos > 0 && stats.switchPos < g.n,
      s"expected a switch, got ${stats.switchPos}")
    assert(stats.syncs > 0, "post-switch DGLL must synchronize")
  }

  test("a huge psiTh never switches (pure PLaNT)") {
    val g = GraphGen.preferentialAttachment(60, 3, seed = 64)
    val r = Ranking.byDegree(g)
    val (_, stats) = Hybrid.run(spark, g, r, q = 2, psiTh = 1e18, batchSize = 8)
    assert(stats.switchPos == -1)
  }

  test("Hybrid broadcasts less than DGLL (communication avoidance)") {
    val g = GraphGen.preferentialAttachment(120, 4, seed = 65)
    val r = Ranking.byDegree(g)
    val (_, hs) = Hybrid.run(spark, g, r, q = 4, psiTh = 20.0, batchSize = 16)
    val (_, ds) = DGLL.run(spark, g, r, q = 4)
    assert(hs.bytesBroadcast < ds.bytesBroadcast,
      s"hybrid ${hs.bytesBroadcast} >= dgll ${ds.bytesBroadcast}")
  }

  test("common table contents match the top-eta hubs' labels") {
    val g = GraphGen.preferentialAttachment(70, 3, seed = 66)
    val r = Ranking.byDegree(g)
    val eta = 8
    val (l, _) = Hybrid.run(spark, g, r, q = 2, psiTh = 1e18, eta = eta, batchSize = 16)
    // rebuild the expected common-table label count from the labeling
    val expected = l.triples.count(t => r.posOf(t.h) < eta)
    assert(expected > 0)
  }

  test("Hybrid label storage stays partitioned across the switch") {
    val g = GraphGen.preferentialAttachment(90, 3, seed = 67)
    val r = Ranking.byDegree(g)
    val q = 4
    val (l, stats) = Hybrid.run(spark, g, r, q, psiTh = 1.0, batchSize = 10)
    assert(stats.perNodeLabels.sum == l.labelCount)
    assert(stats.perNodeLabels.length == q)
  }
}
