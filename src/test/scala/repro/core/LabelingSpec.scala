package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Dijkstra, Ranking}

class LabelingSpec extends AnyFunSuite {

  private val rank = Ranking.identity(4) // rank(v) = v, so 3 outranks all

  private def mk(ts: (Int, Int, Long)*): Labeling =
    Labeling.fromTriples(4, rank, ts.map { case (v, h, d) => LabelTriple(v, h, d) })

  test("query over a single common hub") {
    val l = mk((0, 3, 5), (1, 3, 7))
    assert(l.query(0, 1) == 12)
  }

  test("query takes the minimum over several common hubs") {
    val l = mk((0, 3, 5), (1, 3, 7), (0, 2, 1), (1, 2, 2))
    assert(l.query(0, 1) == 3)
  }

  test("query returns Inf with no common hub") {
    val l = mk((0, 3, 5), (1, 2, 7))
    assert(l.query(0, 1) == Dijkstra.Inf)
  }

  test("self query through a self label is zero") {
    val l = mk((0, 0, 0), (0, 3, 5))
    assert(l.query(0, 0) == 0)
  }

  test("labels are sorted by hub rank descending") {
    val l = mk((0, 1, 9), (0, 3, 5), (0, 2, 7))
    assert(l.hubs(0).toSeq == Seq(3, 2, 1))
    assert(l.dists(0).toSeq == Seq(5L, 7L, 9L))
  }

  test("labelCount, als and storageBytes") {
    val l = mk((0, 0, 0), (1, 1, 0), (1, 0, 4))
    assert(l.labelCount == 3)
    assert(l.als == 3.0 / 4)
    assert(l.storageBytes == 36)
  }

  test("tripleSet round-trips through fromTriples") {
    val ts = Set((0, 3, 5L), (1, 3, 7L), (2, 2, 0L))
    val l  = mk(ts.toSeq: _*)
    assert(l.tripleSet == ts)
  }

  test("empty labeling answers Inf everywhere") {
    val l = Labeling.empty(4, rank)
    assert(l.labelCount == 0)
    assert(l.query(0, 1) == Dijkstra.Inf)
    assert(l.query(2, 2) == Dijkstra.Inf)
  }

  test("query is symmetric") {
    val l = mk((0, 3, 5), (1, 3, 7), (0, 2, 2), (1, 2, 4))
    assert(l.query(0, 1) == l.query(1, 0))
  }

  test("mergeByRank merges two sorted lists stably") {
    val (mh, md) = GLL.mergeByRank(rank,
      Array(3, 1), Array(10L, 30L),
      Array(2, 0), Array(20L, 40L))
    assert(mh.toSeq == Seq(3, 2, 1, 0))
    assert(md.toSeq == Seq(10L, 20L, 30L, 40L))
  }

  test("Cleaning.isRedundant: higher-ranked witness on the path") {
    // L_v = {(3,2),(1,4)}, L_1 = {(3,2),(1,0)}; label (1,4) of v:
    // witness hub 3 with 2+2 <= 4 and rank(3) > rank(1) → redundant
    val lv = (Array(3, 1), Array(2L, 4L))
    val lh = (Array(3, 1), Array(2L, 0L))
    assert(Cleaning.isRedundant(rank, 1, 4L, lv._1, lv._2, lh._1, lh._2))
  }

  test("Cleaning.isRedundant: self-witness terminates as non-redundant") {
    val lv = (Array(3, 1), Array(9L, 4L)) // hub 3 too far: 9+2 > 4
    val lh = (Array(3, 1), Array(2L, 0L))
    assert(!Cleaning.isRedundant(rank, 1, 4L, lv._1, lv._2, lh._1, lh._2))
  }

  test("Cleaning.isRedundant: witness must outrank the hub") {
    // common hub 0 meets the distance condition but ranks below hub 2
    val r3 = Ranking.identity(3)
    val lv = (Array(2, 0), Array(4L, 1L))
    val lh = (Array(2, 0), Array(0L, 3L))
    assert(!Cleaning.isRedundant(r3, 2, 4L, lv._1, lv._2, lh._1, lh._2))
  }
}
