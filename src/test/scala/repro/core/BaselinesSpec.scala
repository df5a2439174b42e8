package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{MoleculeGen, SampleDb}

class BaselinesSpec extends AnyFunSuite {

  private val k = 3
  private val eMax = 3

  test("ALL_g matches greedy over the exhaustively enumerated space") {
    val res = Baselines.allG(SampleDb.db, k, eMax)
    assert(res.patterns.size <= k)
    assert(res.coverage == res.patterns.flatMap(_.cover).toSet.size)
  }

  test("ALL_g achieves (1 - 1/e) of OPT") {
    val opt = Baselines.optimal(SampleDb.db, k, eMax)
    val allg = Baselines.allG(SampleDb.db, k, eMax)
    assert(allg.coverage.toDouble >= (1 - 1 / math.E) * opt.coverage - 1e-9)
  }

  test("FSG_g only selects frequent patterns") {
    val supMin = 0.5 // at least 2 of the 4 sample graphs
    val res = Baselines.fsgG(SampleDb.db, k, eMax, supMin)
    val threshold = Baselines.supportCount(SampleDb.db, supMin)
    res.patterns.foreach(p => assert(p.support >= threshold))
  }

  test("FSG_g never beats ALL_g on coverage") {
    val allg = Baselines.allG(SampleDb.db, k, eMax)
    val fsgg = Baselines.fsgG(SampleDb.db, k, eMax, 0.5)
    assert(fsgg.coverage <= allg.coverage)
  }

  test("ALL_t (swapping) reaches at least 1/4 of OPT") {
    val opt = Baselines.optimal(SampleDb.db, k, eMax)
    val allt = Baselines.allT(SampleDb.db, k, eMax)
    assert(allt.coverage * 4 >= opt.coverage)
  }

  test("FSG_t restricts the swap stream to frequent patterns") {
    val res = Baselines.fsgT(SampleDb.db, k, eMax, 0.5)
    val threshold = Baselines.supportCount(SampleDb.db, 0.5)
    res.patterns.foreach(p => assert(p.support >= threshold))
  }

  test("supportCount converts ratios, clamped at 1") {
    assert(Baselines.supportCount(SampleDb.db, 0.5) == 2)
    assert(Baselines.supportCount(SampleDb.db, 0.3) == 2) // ceil(1.2)
    assert(Baselines.supportCount(SampleDb.db, 0.0) == 1)
  }

  test("timeout reports INF-style result") {
    val db = MoleculeGen.db(MoleculeGen.aidsLike(60))
    val res = Baselines.allG(db, k, eMax = 10, timeoutMillis = 20)
    assert(res.timedOut)
  }

  test("topKFrequent is ordered by support and excludes single edges") {
    val fs = Baselines.topKFrequent(SampleDb.db, 5, eMax, 0.3)
    assert(fs.forall(_.numEdges >= 2))
    assert(fs.map(_.support) == fs.map(_.support).sorted.reverse)
  }

  test("edge-diversified patterns can include infrequent subgraphs (Example 2)") {
    // On the sample db with k=3, the S-O structure of G4 (support 1,
    // infrequent at sup_min=0.5) must appear among TED/ALL_g patterns to
    // cover G4's edges.
    val res = Baselines.allG(SampleDb.db, k, eMax)
    val threshold = Baselines.supportCount(SampleDb.db, 0.5)
    assert(res.patterns.exists(_.support < threshold),
      s"expected an infrequent pattern among ${res.patterns.map(p => (p.key, p.support))}")
  }

  test("greedy baseline beats random-k selection on db10 (Example 1 motivation)") {
    val allg = Baselines.allG(SampleDb.db10, k, eMax)
    // Random selection proxy: the k lexicographically-first patterns.
    val en = new repro.enumeration.Enumerator(SampleDb.db10, eMax)
    val firstK = en.collectAll().take(k)
    val randomCoverage = firstK.flatMap(_.coverGlobal(SampleDb.db10)).toSet.size
    assert(allg.coverage >= randomCoverage)
  }
}
