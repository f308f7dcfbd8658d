package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Table2

/** Reproduces Table 2: dataset statistics of the 12 evaluation graphs
  * (our synthetic analogs next to the paper's originals).
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: dataset analogs") {
    BenchConfig.banner("Table 2 — datasets")
    val rows = Table2.run(BenchConfig.scale)
    println(Table2.format(rows))
    assert(rows.size == 12)
    // relative size ordering within each topology class matches the paper
    val road = rows.filter(_.kind == "road").map(_.n)
    assert(road == road.sorted, "road analogs must grow CAL<EAS<CTR<USA")
    rows.foreach(r => assert(r.m >= r.n - 1 || r.kind == "road"))
  }
}
