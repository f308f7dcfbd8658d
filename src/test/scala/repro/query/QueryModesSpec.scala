package repro.query

import repro.{SparkSpec, TestUtil}
import repro.core.GLL
import repro.graph.{Dijkstra, GraphGen, Ranking}

class QueryModesSpec extends SparkSpec {

  private def fixture(seed: Int) = {
    val (g, _) = TestUtil.graphFor(seed)
    val r      = TestUtil.rankingFor(g, seed)
    val l      = GLL.run(g, r, threads = 4).labeling
    (g, r, l)
  }

  for (seed <- 1 to 8)
    test(s"all three modes agree with Dijkstra (seed=$seed)") {
      val (g, r, l) = fixture(seed)
      val (us, vs)  = QueryModes.genQueries(g.n, 300, seed)
      val d         = Dijkstra.allPairs(g)
      val qlsn = QueryModes.qlsn(spark, l, 16, us, vs)
      val qfdl = QueryModes.qfdl(spark, l, r, 16, us, vs)
      val qdol = QueryModes.qdol(spark, l, 16, us, vs)
      us.indices.foreach { i =>
        val expect = d(us(i))(vs(i))
        assert(qlsn.distances(i) == expect, s"QLSN query ${us(i)}->${vs(i)}")
        assert(qfdl.distances(i) == expect, s"QFDL query ${us(i)}->${vs(i)}")
        assert(qdol.distances(i) == expect, s"QDOL query ${us(i)}->${vs(i)}")
      }
    }

  for (q <- Seq(3, 6, 10, 16, 28, 45, 64))
    test(s"zeta is the largest partition count fitting q=$q nodes") {
      val z = QueryModes.zeta(q)
      assert(z * (z - 1) / 2 <= q)
      assert((z + 1) * z / 2 > q)
    }

  test("QLSN memory is q-fold replicated; QFDL stores each label once") {
    val (_, r, l) = fixture(3)
    val (us, vs)  = QueryModes.genQueries(l.n, 50, 3)
    val qlsn = QueryModes.qlsn(spark, l, 16, us, vs)
    val qfdl = QueryModes.qfdl(spark, l, r, 16, us, vs)
    assert(qlsn.memBytesTotal == 16 * l.storageBytes)
    assert(qfdl.memBytesTotal == l.storageBytes)
    assert(qfdl.memBytesMaxNode <= l.storageBytes)
  }

  test("QDOL memory sits between QFDL and QLSN (the 2q/zeta factor)") {
    val (_, r, l) = fixture(5)
    val (us, vs)  = QueryModes.genQueries(l.n, 50, 5)
    val q = 16
    val qlsn = QueryModes.qlsn(spark, l, q, us, vs)
    val qfdl = QueryModes.qfdl(spark, l, r, q, us, vs)
    val qdol = QueryModes.qdol(spark, l, q, us, vs)
    assert(qdol.memBytesTotal > qfdl.memBytesTotal)
    assert(qdol.memBytesTotal < qlsn.memBytesTotal)
  }

  test("latency ordering: QLSN < QDOL < QFDL-with-broadcast on small labels") {
    val (_, r, l) = fixture(7)
    val (us, vs)  = QueryModes.genQueries(l.n, 200, 7)
    val qlsn = QueryModes.qlsn(spark, l, 16, us, vs)
    val qfdl = QueryModes.qfdl(spark, l, r, 16, us, vs)
    val qdol = QueryModes.qdol(spark, l, 16, us, vs)
    assert(qlsn.latencyMicros < qdol.latencyMicros)
    assert(qdol.latencyMicros < qfdl.latencyMicros)
  }

  test("genQueries is deterministic and in range") {
    val (us1, vs1) = QueryModes.genQueries(100, 500, 9)
    val (us2, vs2) = QueryModes.genQueries(100, 500, 9)
    assert(us1.sameElements(us2) && vs1.sameElements(vs2))
    assert(us1.forall(u => u >= 0 && u < 100))
  }

  test("modes agree on a disconnected graph (Inf results included)") {
    val g = GraphGen.randomSparse(30, 18, 5, seed = 11)
    val r = Ranking.random(g.n, 11)
    val l = GLL.run(g, r, 4).labeling
    val (us, vs) = QueryModes.genQueries(g.n, 200, 11)
    val a = QueryModes.qlsn(spark, l, 16, us, vs).distances
    val b = QueryModes.qfdl(spark, l, r, 16, us, vs).distances
    val c = QueryModes.qdol(spark, l, 16, us, vs).distances
    assert(a.sameElements(b) && a.sameElements(c))
    assert(a.contains(Dijkstra.Inf), "fixture should include unreachable pairs")
  }
}
