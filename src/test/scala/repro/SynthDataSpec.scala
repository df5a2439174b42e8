package repro

import repro.dist.GraphFrames

class SynthDataSpec extends SparkSpec {

  test("moleculeGraphs presets resolve and generate") {
    Seq("aids", "emol", "pubchem", "aidsl").foreach { preset =>
      val ds = SynthData.moleculeGraphs(spark, preset, 10)
      assert(ds.count() == 10)
    }
  }

  test("moleculeGraphs rejects unknown presets") {
    intercept[IllegalArgumentException] {
      SynthData.moleculeGraphs(spark, "nope", 5)
    }
  }

  test("moleculeGraphs aidsl carries bond labels") {
    val db = GraphFrames.collectDb(SynthData.moleculeGraphs(spark, "aidsl", 50))
    assert(db.graphs.exists(_.edgeLabels.exists(_ != 0)))
  }

  test("zipf keys are skewed toward small ranks") {
    val df = SynthData.zipfKeys(spark, 5000, 100)
    val top = df.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
      .collect().head
    assert(top.getLong(0) <= 3, s"most frequent key should be a small rank, got ${top.getLong(0)}")
  }

  test("tpch-lite lineitem generates at tiny scale") {
    assert(SynthData.lineitem(spark, sf = 0.0001).count() > 0)
  }
}
