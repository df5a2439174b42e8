package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 3 — size of the PES-Index, from full TED runs (k=5, E_max=10)
  * over the six scaled dataset variants. Paper: 89 KB–1157 KB absolute,
  * 5.3%–7.6% of the dataset size.
  */
class BenchTable3PesIndexSize extends AnyFunSuite {

  test("Table 3: PES-Index size") {
    BenchShared.banner("Table 3: Size of PES-Index (paper: AIDS10K 234KB/5.39%, AIDS40K 1008KB/5.31%, " +
      "eMol5K 89KB/5.40%, eMol10K 157KB/5.39%, PubChem10K 428KB/5.80%, PubChem23K 1157KB/7.58%)")
    val rows = BenchShared.pesRows
    println(f"${"Dataset"}%-14s ${"Index KB"}%10s ${"Index/Graphs %%"}%16s")
    rows.foreach { r =>
      println(f"${r.dataset}%-14s ${r.indexKB}%10.1f ${r.indexPctOfData}%16.2f")
    }
    rows.foreach { r =>
      assert(!r.timedOut, s"${r.dataset} timed out")
      // Shape: index is a small-to-moderate fraction of the dataset, and
      // grows with dataset size within a family.
      assert(r.indexKB > 0)
      assert(r.indexPctOfData < 100.0, s"${r.dataset}: index larger than data")
    }
    def kb(name: String): Double = rows.find(_.dataset.startsWith(name)).get.indexKB
    val byFamily = rows.grouped(2).toSeq
    byFamily.foreach { case Seq(small, large) =>
      assert(large.indexKB > small.indexKB,
        s"index should grow with dataset size: ${small.dataset} ${small.indexKB} vs ${large.dataset} ${large.indexKB}")
    }
    assert(kb("eMol") > 0)
  }
}
