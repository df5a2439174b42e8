package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestGraphs
import repro.data.SampleDb

class LabeledGraphSpec extends AnyFunSuite {

  private val triangle = LabeledGraph(1, Seq(0, 1, 2), Seq((0, 1, 5), (1, 2, 6), (2, 0, 7)))

  test("vertex and edge counts") {
    assert(triangle.numVertices == 3)
    assert(triangle.numEdges == 3)
  }

  test("vertex labels") {
    assert((0 to 2).map(triangle.vertexLabel) == Seq(0, 1, 2))
  }

  test("edge labels") {
    assert((0 to 2).map(triangle.edgeLabel) == Seq(5, 6, 7))
  }

  test("degrees of a triangle are all 2") {
    assert((0 to 2).forall(triangle.degree(_) == 2))
  }

  test("edgeBetween finds both orientations") {
    assert(triangle.edgeBetween(0, 1) == 0)
    assert(triangle.edgeBetween(1, 0) == 0)
    assert(triangle.edgeBetween(2, 0) == 2)
  }

  test("edgeBetween returns -1 for absent edges") {
    val path = LabeledGraph(2, Seq(0, 0, 0), Seq((0, 1, 0), (1, 2, 0)))
    assert(path.edgeBetween(0, 2) == -1)
  }

  test("hasEdge agrees with edgeBetween") {
    val path = LabeledGraph(2, Seq(0, 0, 0), Seq((0, 1, 0), (1, 2, 0)))
    assert(path.hasEdge(1, 2) && !path.hasEdge(0, 2))
  }

  test("foreachNeighbor visits each incident edge exactly once") {
    var seen = List.empty[(Int, Int)]
    triangle.foreachNeighbor(1)((w, e) => seen ::= (w, e))
    assert(seen.toSet == Set((0, 0), (2, 1)))
  }

  test("self loops are rejected") {
    intercept[IllegalArgumentException] {
      LabeledGraph(9, Seq(0, 1), Seq((0, 0, 0)))
    }
  }

  test("isConnected on connected and disconnected graphs") {
    assert(triangle.isConnected)
    val disconnected = new LabeledGraph(3, Array(0, 0, 0, 0), Array(0, 2), Array(1, 3), Array(0, 0))
    assert(!disconnected.isConnected)
  }

  test("labelSignature is invariant under vertex permutation") {
    val rng = new Random(1)
    (1 to 10).foreach { _ =>
      val g = TestGraphs.randomConnected(rng, 6, 3, 3, 2)
      assert(TestGraphs.permuted(g, rng).labelSignature == g.labelSignature)
    }
  }

  test("sample database graphs are connected") {
    assert(SampleDb.db.graphs.forall(_.isConnected))
    assert(SampleDb.db10.graphs.forall(_.isConnected))
  }

  test("GraphDb global edge ids partition the edge space") {
    val db = SampleDb.db
    assert(db.totalEdges == db.graphs.map(_.numEdges).sum)
    assert(db.globalEdge(0, 0) == 0)
    assert(db.globalEdge(1, 0) == db.graphs(0).numEdges)
    val last = db.globalEdge(db.numGraphs - 1, db.graphs.last.numEdges - 1)
    assert(last == db.totalEdges - 1)
  }

  test("GraphDb.graphOfEdge inverts globalEdge") {
    val db = SampleDb.db10
    for (gi <- 0 until db.numGraphs; e <- 0 until db.graphs(gi).numEdges)
      assert(db.graphOfEdge(db.globalEdge(gi, e)) == gi)
  }

  test("GraphDb size estimate counts vertices and edges (SDF-like)") {
    val db = repro.TestGraphs.db(triangle)
    assert(db.sizeBytesEstimate == 200L + 44L * 3 + 22L * 3)
  }

  test("parallel array mismatch is rejected") {
    intercept[IllegalArgumentException] {
      new LabeledGraph(0, Array(0, 1), Array(0), Array(1, 0), Array(0))
    }
  }
}
