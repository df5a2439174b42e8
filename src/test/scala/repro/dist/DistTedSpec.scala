package repro.dist

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.{Baselines, Ted, TedConfig}
import repro.data.{MoleculeGen, SampleDb}
import repro.graph.DfsCode

class DistTedSpec extends SparkSpec {

  private lazy val db = SampleDb.db
  private lazy val ds = GraphFrames.toDS(spark, db).repartition(2)
  private val cfg = TedConfig(k = 3, eMax = 3)

  test("local candidates are canonical codes") {
    val cands = DistTed.localCandidates(spark, ds, cfg)
    assert(cands.nonEmpty)
    cands.foreach { c =>
      assert(repro.graph.CanonicalCode.isMin(DfsCode.parse(c)), s"non-canonical $c")
    }
  }

  test("coverDS matches the driver-side SubIso cover sets") {
    val cands = DistTed.localCandidates(spark, ds, cfg)
    val covers = DistTed.coverDS(spark, ds, cands).collect()
    covers.foreach { pc =>
      val p = DfsCode.toGraph(DfsCode.parse(pc.code))
      val gi = db.graphs.indexWhere(_.id == pc.graph_id)
      val expected = repro.iso.SubIso.coverSet(p, db.graphs(gi)).toSet
      assert(pc.edges.toSet == expected, s"${pc.code} over graph ${pc.graph_id}")
    }
  }

  test("union coverage via Spark SQL matches the DuckDB oracle") {
    import spark.implicits._
    val cands = DistTed.localCandidates(spark, ds, cfg)
    val coverDf = DistTed.coverDF(spark, ds, cands)
    val sparkAgg = coverDf.selectExpr("count(DISTINCT graph_id, edge_id) AS covered")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT count(*) AS covered FROM (SELECT DISTINCT graph_id, edge_id FROM cov)",
      "cov" -> coverDf,
    )
  }

  test("distributed TED coverage tracks sequential TED") {
    val seq = Ted.full(db, cfg)
    val dist = DistTed.run(spark, ds, cfg)
    assert(dist.result.totalEdges == db.totalEdges)
    assert(dist.result.coverage >= (0.8 * seq.coverage).toInt,
      s"dist ${dist.result.coverage} vs seq ${seq.coverage}")
  }

  test("distributed TED respects k and eMax") {
    val dist = DistTed.run(spark, ds, cfg)
    assert(dist.result.patterns.size <= cfg.k)
    assert(dist.result.patterns.forall(_.numEdges <= cfg.eMax))
  }

  test("single-partition distributed run reproduces sequential coverage") {
    val one = GraphFrames.toDS(spark, db).coalesce(1)
    val seq = Ted.full(db, cfg)
    val dist = DistTed.run(spark, one, cfg)
    // One partition => the local phase is exactly sequential TED; the
    // final greedy over its k patterns can only reorder, not lose edges.
    assert(dist.result.coverage == seq.coverage)
  }

  test("widened local budget can only help the candidate pool") {
    val base = DistTed.run(spark, ds, cfg)
    val wide = DistTed.run(spark, ds, cfg, localK = 6)
    assert(wide.candidatePoolSize >= base.candidatePoolSize)
    assert(wide.result.coverage >= base.result.coverage - 1)
  }

  test("distributed TED on generated molecules reaches sane coverage") {
    val p = MoleculeGen.aidsLike(30)
    val mds = GraphFrames.generateDS(spark, p, partitions = 4)
    val mdb = MoleculeGen.db(p)
    val dist = DistTed.run(spark, mds, TedConfig(k = 4, eMax = 3))
    val allg = Baselines.allG(mdb, 4, 3)
    assert(dist.result.coverage >= (0.6 * allg.coverage).toInt,
      s"dist ${dist.result.coverage} vs ALL_g ${allg.coverage}")
  }
}
