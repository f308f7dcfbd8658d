package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.GraphGen

class GLLSpec extends AnyFunSuite {

  for (seed <- 1 to 16)
    test(s"GLL (alpha=4) outputs the canonical labeling (seed=$seed)") {
      val (g, _) = TestUtil.graphFor(seed)
      val r      = TestUtil.rankingFor(g, seed)
      val res    = GLL.run(g, r, threads = 4, alpha = 4.0)
      TestUtil.assertCanonical(res.labeling, g, r)
      TestUtil.assertCover(res.labeling, g)
    }

  for (alpha <- Seq(1.0, 2.0, 8.0, 32.0))
    test(s"GLL canonical for synchronization threshold alpha=$alpha") {
      val g = GraphGen.preferentialAttachment(70, 3, seed = 21)
      val r = TestUtil.rankingFor(g, 2)
      TestUtil.assertCanonical(GLL.run(g, r, threads = 4, alpha = alpha).labeling, g, r)
    }

  for (threads <- Seq(1, 2, 8, 16))
    test(s"GLL canonical at $threads threads") {
      val g = GraphGen.grid(6, 7, seed = threads)
      val r = TestUtil.rankingFor(g, threads)
      TestUtil.assertCanonical(GLL.run(g, r, threads, alpha = 2.0).labeling, g, r)
    }

  test("small alpha produces more supersteps than LCC's single one") {
    val g = GraphGen.preferentialAttachment(100, 3, seed = 23)
    val r = TestUtil.rankingFor(g, 3)
    val gll = GLL.run(g, r, threads = 2, alpha = 1.0)
    assert(gll.supersteps > 1, s"expected multiple supersteps, got ${gll.supersteps}")
  }

  test("GLL and LCC produce the same labeling") {
    val g = GraphGen.randomConnected(90, 50, 8, seed = 24)
    val r = TestUtil.rankingFor(g, 1)
    assert(GLL.run(g, r, 4, 4.0).labeling.tripleSet == GLL.runLCC(g, r, 4).labeling.tripleSet)
  }

  test("GLL label accounting: generated = final + removed") {
    val g = GraphGen.preferentialAttachment(80, 4, seed = 25)
    val r = TestUtil.rankingFor(g, 0)
    val res = GLL.run(g, r, threads = 8, alpha = 2.0)
    assert(res.labelsGenerated == res.labeling.labelCount + res.redundantRemoved)
  }

  test("construct and clean times partition the run") {
    val g = GraphGen.grid(8, 8)
    val r = TestUtil.rankingFor(g, 2)
    val res = GLL.run(g, r, threads = 4, alpha = 4.0)
    assert(res.constructMs + res.cleanMs <= res.timeMs + 50)
  }

  test("GLL ALS equals the reference CHL ALS") {
    val g = GraphGen.preferentialAttachment(60, 3, seed = 27)
    val r = TestUtil.rankingFor(g, 2)
    val res = GLL.run(g, r, 4, 4.0)
    assert(math.abs(res.labeling.als - ReferenceCHL(g, r).als) < 1e-12)
  }
}
