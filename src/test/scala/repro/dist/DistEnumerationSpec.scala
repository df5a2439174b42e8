package repro.dist

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{MoleculeGen, SampleDb}
import repro.enumeration.Enumerator

class DistEnumerationSpec extends SparkSpec {

  private lazy val db = SampleDb.db
  private lazy val ds = GraphFrames.toDS(spark, db).repartition(3)

  test("distributed pattern occurrences match the sequential enumerator") {
    val dist = DistEnumeration.patternOccurrences(spark, ds, eMax = 2)
      .collect().map(o => (o.code, o.graph_id)).toSet
    val en = new Enumerator(db, 2)
    val local = scala.collection.mutable.Set.empty[(String, Long)]
    en.traverse { n =>
      n.graphIds.foreach(gi => local += ((n.key, db.graphs(gi).id)))
      true
    }
    assert(dist == local.toSet)
  }

  test("supports match the sequential supports") {
    val dist = DistEnumeration.supports(spark, ds, eMax = 2)
      .collect().map(r => (r.getString(0), r.getLong(1))).toMap
    val en = new Enumerator(db, 2)
    en.traverse { n =>
      assert(dist(n.key) == n.support.toLong, s"support mismatch for ${n.key}")
      true
    }
  }

  test("supports aggregation matches the DuckDB oracle") {
    import spark.implicits._
    val occ = DistEnumeration.patternOccurrences(spark, ds, eMax = 2).toDF()
    Oracle.assertEquivalent(
      DistEnumeration.supports(spark, ds, eMax = 2),
      "SELECT code, count(DISTINCT graph_id) AS support FROM occ GROUP BY code",
      "occ" -> occ,
    )
  }

  test("frequent filter applies the ceil(supMin * |D|) threshold") {
    val freq = DistEnumeration.frequent(spark, ds, eMax = 2, supMin = 0.5)
      .collect().map(r => (r.getString(0), r.getLong(1))).toMap
    assert(freq.nonEmpty)
    assert(freq.values.forall(_ >= 2))
    val all = DistEnumeration.supports(spark, ds, eMax = 2)
      .collect().map(r => (r.getString(0), r.getLong(1))).toMap
    assert(freq.keySet == all.filter(_._2 >= 2).keySet)
  }

  test("partitioning does not change the result") {
    val one = DistEnumeration.supports(spark, GraphFrames.toDS(spark, db).coalesce(1), 2)
      .collect().map(r => (r.getString(0), r.getLong(1))).toSet
    val many = DistEnumeration.supports(spark, GraphFrames.toDS(spark, db).repartition(4), 2)
      .collect().map(r => (r.getString(0), r.getLong(1))).toSet
    assert(one == many)
  }

  test("distributed frequent mining on generated molecules is consistent") {
    val p = MoleculeGen.aidsLike(24)
    val mds = GraphFrames.generateDS(spark, p, partitions = 4)
    val mdb = MoleculeGen.db(p)
    val dist = DistEnumeration.frequent(spark, mds, eMax = 2, supMin = 0.25)
      .collect().map(r => r.getString(0)).toSet
    val en = new Enumerator(mdb, 2, minSupport = 6) // ceil(0.25 * 24)
    val local = en.collectAll().map(_.key).toSet
    assert(dist == local)
  }
}
