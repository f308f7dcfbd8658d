package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class CsrGraphSpec extends AnyFunSuite {

  test("builds a triangle with symmetric adjacency") {
    val g = CsrGraph.fromEdges(3, Seq((0, 1, 5), (1, 2, 3), (0, 2, 7)))
    assert(g.n == 3)
    assert(g.m == 3)
    assert(g.arcCount == 6)
    assert((0 until 3).forall(v => g.degree(v) == 2))
  }

  test("degree counts both directions of undirected edges") {
    val g = CsrGraph.fromEdges(4, Seq((0, 1, 1), (0, 2, 1), (0, 3, 1)))
    assert(g.degree(0) == 3)
    assert(g.degree(1) == 1 && g.degree(2) == 1 && g.degree(3) == 1)
  }

  test("self-loops are dropped") {
    val g = CsrGraph.fromEdges(3, Seq((0, 0, 1), (0, 1, 2)))
    assert(g.m == 1)
    assert(g.degree(0) == 1)
  }

  test("directed=false stores arcs once per direction") {
    val g = CsrGraph.fromEdges(3, Seq((0, 1, 2)), undirected = false)
    assert(g.degree(0) == 1 && g.degree(1) == 0)
  }

  test("rejects non-positive weights") {
    assertThrows[IllegalArgumentException](CsrGraph.fromEdges(2, Seq((0, 1, 0))))
    assertThrows[IllegalArgumentException](CsrGraph.fromEdges(2, Seq((0, 1, -3))))
  }

  test("rejects out-of-range endpoints") {
    assertThrows[IllegalArgumentException](CsrGraph.fromEdges(2, Seq((0, 2, 1))))
  }

  test("empty graph") {
    val g = CsrGraph.fromEdges(5, Seq.empty)
    assert(g.m == 0 && g.maxWeight == 0)
    assert((0 until 5).forall(g.degree(_) == 0))
  }

  test("maxWeight and distanceBound") {
    val g = CsrGraph.fromEdges(3, Seq((0, 1, 4), (1, 2, 9)))
    assert(g.maxWeight == 9)
    assert(g.distanceBound == 9L * 3 + 1)
  }

  test("adjacency lists contain exactly the inserted neighbors") {
    val g = CsrGraph.fromEdges(4, Seq((0, 1, 1), (0, 2, 2), (1, 3, 3)))
    val n0 = (g.offsets(0) until g.offsets(1)).map(g.nbrs).toSet
    assert(n0 == Set(1, 2))
    val n3 = (g.offsets(3) until g.offsets(4)).map(g.nbrs).toSet
    assert(n3 == Set(1))
  }

  test("parallel edges are preserved (Dijkstra picks the cheaper)") {
    val g = CsrGraph.fromEdges(2, Seq((0, 1, 5), (0, 1, 2)))
    assert(g.m == 2)
    assert(Dijkstra.sssp(g, 0)(1) == 2)
  }

  for (seed <- 1 to 6)
    test(s"CSR round-trip preserves weighted adjacency (seed=$seed)") {
      val rnd = new scala.util.Random(seed)
      val n = 10 + rnd.nextInt(20)
      val edges = Seq.fill(30)((rnd.nextInt(n), rnd.nextInt(n), 1 + rnd.nextInt(9)))
        .filter { case (u, v, _) => u != v }
      val g = CsrGraph.fromEdges(n, edges)
      val expect = edges.flatMap { case (u, v, w) => Seq((u, v, w), (v, u, w)) }
        .groupBy(identity).view.mapValues(_.size).toMap
      val got = (0 until n).flatMap { v =>
        (g.offsets(v) until g.offsets(v + 1)).map(e => (v, g.nbrs(e), g.wts(e)))
      }.groupBy(identity).view.mapValues(_.size).toMap
      assert(got == expect)
    }
}
