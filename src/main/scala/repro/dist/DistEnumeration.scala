package repro.dist

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.enumeration.Enumerator
import repro.graph.GraphDb

/** One (pattern, containing-graph) occurrence — pattern identified by its
  * canonical DFS-code key (enumeration only ever emits minimum codes, so
  * equal keys mean isomorphic patterns across partitions).
  */
final case class PatternOcc(code: String, graph_id: Long)

/** Distributed subgraph enumeration and frequent-subgraph mining: a
  * mapPartitions scan runs the exact sequential enumerator per shard of
  * graphs; supports are then a relational groupBy/count-distinct — pattern
  * occurrence is a per-graph property, so the shard union is exact.
  */
object DistEnumeration {

  /** Every (pattern, graph) containment pair for patterns up to eMax
    * edges. Exponential in eMax by nature — callers keep eMax small.
    */
  def patternOccurrences(spark: SparkSession, ds: Dataset[GraphRow], eMax: Int): Dataset[PatternOcc] = {
    import spark.implicits._
    ds.mapPartitions { it =>
      val graphs = it.map(GraphFrames.toGraph).toIndexedSeq
      if (graphs.isEmpty) Iterator.empty
      else {
        val db = new GraphDb(graphs)
        val en = new Enumerator(db, eMax, 1, Long.MaxValue)
        val out = scala.collection.mutable.ArrayBuffer.empty[PatternOcc]
        en.traverse { node =>
          node.graphIds.foreach(gi => out += PatternOcc(node.key, db.graphs(gi).id))
          true
        }
        out.iterator
      }
    }
  }

  /** Per-pattern support (distinct containing graphs) via Spark SQL. */
  def supports(spark: SparkSession, ds: Dataset[GraphRow], eMax: Int): DataFrame =
    patternOccurrences(spark, ds, eMax)
      .groupBy("code")
      .agg(countDistinct("graph_id").as("support"))

  /** Frequent patterns at ratio `supMin` of the database size (Definition
    * of sup_min, Section 1) — the distributed FSG substrate.
    */
  def frequent(spark: SparkSession, ds: Dataset[GraphRow], eMax: Int, supMin: Double): DataFrame = {
    val n = ds.count()
    val threshold = math.max(1L, math.ceil(supMin * n).toLong)
    supports(spark, ds, eMax).filter(col("support") >= threshold)
  }
}
