package repro

import org.scalatest.Assertions._
import repro.core.{Labeling, ReferenceCHL}
import repro.graph.{CsrGraph, Dijkstra, GraphGen, Ranking}

/** Shared fixtures and assertions for the labeling test suites. */
object TestUtil {

  /** A varied family of small graphs keyed by seed: sparse (possibly
    * disconnected), connected random, grid, preferential attachment.
    */
  def graphFor(seed: Int): (CsrGraph, String) = (seed % 4) match {
    case 0 => (GraphGen.randomSparse(20 + seed % 17, 35 + seed % 23, maxW = 9, seed), "sparse")
    case 1 => (GraphGen.randomConnected(25 + seed % 13, extra = 12, maxW = 7, seed), "connected")
    case 2 => (GraphGen.grid(4 + seed % 3, 5 + seed % 4, seed), "grid")
    case _ => (GraphGen.preferentialAttachment(24 + seed % 11, 2 + seed % 3, seed), "ba")
  }

  /** Matching ranking family: identity, random, degree, betweenness. */
  def rankingFor(g: CsrGraph, seed: Int): Ranking = (seed % 4) match {
    case 0 => Ranking.identity(g.n)
    case 1 => Ranking.random(g.n, seed)
    case 2 => Ranking.byDegree(g)
    case _ => Ranking.byApproxBetweenness(g, samples = 8, seed = seed)
  }

  /** Cover property: label queries must reproduce every pairwise Dijkstra
    * distance exactly (including Inf for disconnected pairs).
    */
  def assertCover(l: Labeling, g: CsrGraph): Unit = {
    val d = Dijkstra.allPairs(g)
    var bad = List.empty[String]
    for (u <- 0 until g.n; v <- 0 until g.n) {
      val got = l.query(u, v)
      if (got != d(u)(v))
        bad ::= s"query($u,$v)=$got expected ${d(u)(v)}"
    }
    assert(bad.isEmpty, s"cover violated (${bad.size} pairs), e.g. ${bad.take(3)}")
  }

  /** Canonicality: the label set must be exactly the brute-force CHL. */
  def assertCanonical(l: Labeling, g: CsrGraph, rank: Ranking): Unit = {
    val expected = ReferenceCHL.labelSet(g, rank)
    val got      = l.tripleSet
    val extra    = got.diff(expected)
    val missing  = expected.diff(got)
    assert(extra.isEmpty && missing.isEmpty,
      s"not canonical: ${extra.size} extra (e.g. ${extra.take(3)}), " +
      s"${missing.size} missing (e.g. ${missing.take(3)})")
  }

  /** `respects R` (Def. 3): for every connected pair the canonical hub of
    * the pair is present in both label sets — checked against brute force.
    */
  def assertRespectsR(l: Labeling, g: CsrGraph, rank: Ranking): Unit = {
    val expected = ReferenceCHL.labelSet(g, rank)
    val got      = l.tripleSet
    val missing  = expected.diff(got)
    assert(missing.isEmpty, s"does not respect R: missing ${missing.take(5)}")
  }
}
