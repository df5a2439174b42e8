package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 4 — maintenance time of the PES-Index from the same runs as
  * Table 3. Paper: 0.25 s–2.85 s, and 0.78%–6.86% of total processing
  * time (always < 7%).
  */
class BenchTable4PesIndexTime extends AnyFunSuite {

  test("Table 4: PES-Index maintenance time") {
    BenchShared.banner("Table 4: Maintenance Time of PES-Index (paper: AIDS10K 0.5s/6.86%, " +
      "AIDS40K 1.88s/1.00%, eMol5K 0.25s/4.12%, eMol10K 0.37s/3.63%, PubChem10K 1.1s/0.78%, PubChem23K 2.85s/1.39%)")
    val rows = BenchShared.pesRows
    println(f"${"Dataset"}%-14s ${"Index Time s"}%13s ${"Index/Total %%"}%15s ${"Total s"}%9s ${"CovRate"}%8s")
    rows.foreach { r =>
      println(f"${r.dataset}%-14s ${r.indexTimeS}%13.3f ${r.indexPctOfTotal}%15.2f ${r.totalS}%9.2f ${r.coverageRate}%8.4f")
    }
    rows.foreach { r =>
      assert(!r.timedOut)
      // Shape: maintenance is a small share of total time (paper < 7%; we
      // allow < 25% since our total is milliseconds, not kiloseconds).
      assert(r.indexPctOfTotal < 25.0,
        s"${r.dataset}: index time ${r.indexPctOfTotal}%% of total")
    }
    // Maintenance time grows with dataset size within a family.
    BenchShared.pesRows.grouped(2).foreach { case Seq(small, large) =>
      assert(large.indexTimeS >= small.indexTimeS * 0.5,
        s"unexpected time collapse: ${small.dataset} -> ${large.dataset}")
    }
  }
}
