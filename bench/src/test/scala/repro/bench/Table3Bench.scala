package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Table3

/** Reproduces Table 3: shared-memory label construction — ALS and build
  * time for SparaPLL (baseline), the canonical ALS, and seqPLL / LCC / GLL
  * times, over all 12 dataset analogs.
  *
  * Paper-shape assertions: SparaPLL's labeling is never smaller than the
  * CHL, and the parallel algorithms beat seqPLL on the large datasets.
  */
class Table3Bench extends AnyFunSuite {

  test("Table 3: shared-memory algorithms") {
    BenchConfig.banner("Table 3 — shared-memory labeling")
    val rows = Table3.run(BenchConfig.scale, BenchConfig.threads, alpha = 4.0)
    println(Table3.format(rows))

    rows.foreach { r =>
      assert(r.chlAls > 0, r.dataset)
      // minimality of the CHL vs paraPLL's redundant labeling (ALS column);
      // 2% slack for scheduling nondeterminism in the racing trees
      assert(r.sparaAls >= 0.98 * r.chlAls,
        s"${r.dataset}: SparaPLL ALS ${r.sparaAls} below CHL ${r.chlAls}")
      assert(r.gllTimeS > 0 && r.lccTimeS > 0 && r.sparaTimeS > 0)
    }
    // the paper's headline: parallel construction beats sequential PLL on
    // the heavy datasets (usa/ctr/pok are the slowest for seqPLL)
    val heavy = rows.filter(r => Set("ctr-lite", "usa-lite", "pok-lite")(r.dataset))
    heavy.foreach { r =>
      assert(r.seqTimeS > r.gllTimeS,
        s"${r.dataset}: seqPLL ${r.seqTimeS}s not slower than GLL ${r.gllTimeS}s")
    }
  }
}
