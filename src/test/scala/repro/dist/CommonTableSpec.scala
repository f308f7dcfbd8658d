package repro.dist

import org.scalatest.funsuite.AnyFunSuite
import repro.core.LabelTriple
import repro.graph.{Dijkstra, Ranking}

class CommonTableSpec extends AnyFunSuite {

  private val rank = Ranking.identity(6) // order = 5,4,3,2,1,0; pos(5)=0

  test("empty table covers nothing") {
    val hc = CommonTable.empty(2, 6)
    assert(!hc.covered(0, 1, 100, rank))
    assert(hc.labelCount == 0)
  }

  test("covered requires both endpoints labelled and the sum within delta") {
    // top hub is vertex 5 (pos 0)
    val hc = CommonTable.empty(2, 6)
      .updated(rank, Seq(LabelTriple(0, 5, 3), LabelTriple(1, 5, 4)))
    assert(hc.covered(0, 1, 7, rank))
    assert(hc.covered(0, 1, 8, rank))
    assert(!hc.covered(0, 1, 6, rank))
    assert(!hc.covered(0, 2, 100, rank)) // vertex 2 unlabelled
  }

  test("only hubs strictly above the root may prune") {
    val hc = CommonTable.empty(2, 6)
      .updated(rank, Seq(LabelTriple(0, 5, 1), LabelTriple(4, 5, 1), LabelTriple(1, 4, 1), LabelTriple(0, 4, 1)))
    // root 5 is the top hub itself: nothing outranks it
    assert(!hc.covered(0, 5, 100, rank))
    // root 4: hub 5 (pos 0 < pos(4)=1) may prune
    assert(hc.covered(0, 4, 2, rank))
    // root 0: hub 4 labels both 1 and 0, so SP(0,1) is covered
    assert(hc.covered(1, 0, 100, rank))
    assert(!hc.covered(1, 0, 1, rank)) // but not within delta=1
  }

  test("updated is copy-on-write: the original instance is unchanged") {
    val a = CommonTable.empty(1, 6)
    val b = a.updated(rank, Seq(LabelTriple(2, 5, 7)))
    assert(a.distOf(0, 2) == Dijkstra.Inf)
    assert(b.distOf(0, 2) == 7)
    assert(a.labelCount == 0 && b.labelCount == 1)
  }

  test("updated rejects hubs outside the top eta") {
    val hc = CommonTable.empty(1, 6)
    assertThrows[IllegalArgumentException](hc.updated(rank, Seq(LabelTriple(0, 3, 2))))
  }

  test("labelCount counts stored labels") {
    val hc = CommonTable.empty(3, 6)
      .updated(rank, Seq(LabelTriple(0, 5, 1), LabelTriple(1, 5, 2), LabelTriple(2, 3, 3)))
    assert(hc.labelCount == 3)
  }
}
