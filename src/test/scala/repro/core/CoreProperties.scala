package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import repro.graph.{CsrGraph, Dijkstra, GraphGen, LongMinHeap, Ranking}

/** ScalaCheck property suites over the pure (non-Spark) core.
  *
  * These run under sbt's native ScalaCheck framework alongside the
  * ScalaTest suites and hammer the algorithms with randomized inputs well
  * beyond the fixed seeds used elsewhere.
  */
object CoreProperties extends Properties("repro.core") {

  private val smallGraph: Gen[CsrGraph] = for {
    n    <- Gen.choose(2, 28)
    m    <- Gen.choose(1, 3 * n)
    maxW <- Gen.choose(1, 9)
    seed <- Gen.choose(0L, 1000000L)
  } yield GraphGen.randomSparse(n, m, maxW, seed)

  private val graphWithRank: Gen[(CsrGraph, Ranking)] = for {
    g    <- smallGraph
    seed <- Gen.choose(0L, 1000000L)
  } yield (g, Ranking.random(g.n, seed))

  property("heap pops every pushed element in nondecreasing order") =
    Prop.forAll(Gen.listOf(Gen.zip(Gen.choose(0L, 1 << 20), Gen.choose(0, 1000)))) { items =>
      val h = new LongMinHeap(4)
      items.foreach { case (d, v) => h.push(d, v) }
      var prev = -1L; var cnt = 0; var ok = true
      while (h.nonEmpty) {
        ok &&= h.topDist >= prev
        prev = h.topDist; h.pop(); cnt += 1
      }
      ok && cnt == items.size
    }

  property("byScore ranking is a permutation ordered by score") =
    Prop.forAll(Gen.nonEmptyListOf(Gen.choose(0.0, 100.0))) { scores =>
      val r = Ranking.byScore(scores.toArray)
      val perm = r.rankOf.sorted.sameElements(scores.indices)
      val mono = r.order.toSeq.map(scores).zip(r.order.toSeq.tail.map(scores))
        .forall { case (a, b) => a >= b }
      perm && mono
    }

  property("Dijkstra agrees with Floyd-Warshall") =
    Prop.forAll(smallGraph) { g =>
      val a = Dijkstra.allPairs(g)
      val b = Dijkstra.floydWarshall(g)
      (0 until g.n).forall(u => a(u).sameElements(b(u)))
    }

  property("seqPLL emits exactly the reference canonical labeling") =
    Prop.forAll(graphWithRank) { case (g, r) =>
      SeqPLL.run(g, r).labeling.tripleSet == ReferenceCHL.labelSet(g, r)
    }

  property("seqPLL labeling answers every pair like Dijkstra") =
    Prop.forAll(graphWithRank) { case (g, r) =>
      val l = SeqPLL.run(g, r).labeling
      val d = Dijkstra.allPairs(g)
      (0 until g.n).forall(u => (0 until g.n).forall(v => l.query(u, v) == d(u)(v)))
    }

  property("shared-memory PLaNT trees reproduce the canonical labeling") =
    Prop.forAll(graphWithRank) { case (g, r) =>
      // PlantTree is pure; plant every root on this thread, no cluster
      val scratch = new DijkstraScratch(g.n)
      val out = Set.newBuilder[(Int, Int, Long)]
      (0 until g.n).foreach { pos =>
        val root = r.order(pos)
        repro.dist.PlantTree.build(g, r, root, hc = null, scratch,
          sink = (v, d) => out += ((v, root, d)))
      }
      out.result() == ReferenceCHL.labelSet(g, r)
    }

  property("GLL at random alpha equals seqPLL") =
    Prop.forAll(graphWithRank, Gen.choose(1.0, 16.0)) { case ((g, r), alpha) =>
      GLL.run(g, r, threads = 4, alpha).labeling.tripleSet ==
        SeqPLL.run(g, r).labeling.tripleSet
    }

  property("paraPLL labeling still covers all pairs") =
    Prop.forAll(graphWithRank) { case (g, r) =>
      val l = ParaPLL.run(g, r, threads = 4).labeling
      val d = Dijkstra.allPairs(g)
      (0 until g.n).forall(u => (0 until g.n).forall(v => l.query(u, v) == d(u)(v)))
    }

  property("mergeByRank keeps rank-descending order and all elements") =
    Prop.forAll(graphWithRank, Gen.choose(0L, 1000L)) { case ((g, r), seed) =>
      val rnd  = new scala.util.Random(seed)
      val all  = rnd.shuffle((0 until g.n).toList)
      val (xs, ys) = all.splitAt(rnd.nextInt(all.size + 1))
      def sorted(vs: List[Int]) = vs.sortBy(v => -r(v)).toArray
      val (h1, h2) = (sorted(xs), sorted(ys))
      val (mh, _)  = GLL.mergeByRank(r, h1, h1.map(_.toLong), h2, h2.map(_.toLong))
      val ordered  = mh.toSeq.zip(mh.toSeq.tail).forall { case (a, b) => r(a) >= r(b) }
      ordered && mh.sorted.sameElements((h1 ++ h2).sorted)
    }

  property("labeling query is symmetric") =
    Prop.forAll(graphWithRank) { case (g, r) =>
      val l = SeqPLL.run(g, r).labeling
      (0 until g.n).forall(u => (0 until g.n).forall(v => l.query(u, v) == l.query(v, u)))
    }

  property("every hub outranks or equals the vertex it labels") =
    Prop.forAll(graphWithRank) { case (g, r) =>
      SeqPLL.run(g, r).labeling.triples.forall(t => t.v == t.h || r(t.h) > r(t.v))
    }

  property("sortByRankDesc sorts any parallel label arrays") =
    Prop.forAll(graphWithRank, Gen.choose(0L, 1000L)) { case ((g, r), seed) =>
      val rnd  = new scala.util.Random(seed)
      val hubs = Array.fill(rnd.nextInt(20))(rnd.nextInt(g.n))
      val dist = hubs.map(h => h.toLong * 7)
      Labeling.sortByRankDesc(r, hubs, dist)
      val ordered = hubs.toSeq.zip(hubs.toSeq.drop(1)).forall { case (a, b) => r(a) >= r(b) }
      val paired  = hubs.zip(dist).forall { case (h, d) => d == h.toLong * 7 }
      ordered && paired
    }
}
