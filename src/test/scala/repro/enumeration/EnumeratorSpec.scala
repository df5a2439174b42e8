package repro.enumeration

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable
import scala.util.Random
import repro.TestGraphs
import repro.data.SampleDb
import repro.graph.{GraphDb, LabeledGraph}

class EnumeratorSpec extends AnyFunSuite {

  private def enumerate(db: GraphDb, eMax: Int, minSupport: Int = 1): Seq[PatternNode] = {
    val en = new Enumerator(db, eMax, minSupport)
    en.collectAll()
  }

  test("roots are the distinct labeled edges") {
    val db = SampleDb.db
    val roots = new Enumerator(db, 1).roots
    // Sample DB edge types: C-C, C-O, N-C, S-O.
    assert(roots.length == 4)
    assert(roots.forall(_.numEdges == 1))
  }

  test("root embeddings include both orientations for symmetric labels") {
    val t = LabeledGraph(0, Seq(0, 0), Seq((0, 1, 0)))
    val roots = new Enumerator(new GraphDb(IndexedSeq(t)), 1).roots
    assert(roots.length == 1)
    assert(roots.head.embeddings.length == 2)
  }

  test("enumeration matches brute force on a triangle with pendant") {
    val g = LabeledGraph(0, Seq(0, 0, 0, 1), Seq((0, 1, 0), (1, 2, 0), (2, 0, 0), (0, 3, 0)))
    val db = new GraphDb(IndexedSeq(g))
    val expected = TestGraphs.bruteForceSubgraphs(g, 4)
    val got = enumerate(db, 4).map(_.key)
    assert(got.toSet == expected.keySet)
    assert(got.distinct.length == got.length, "duplicate canonical codes enumerated")
  }

  test("enumeration matches brute force on random graphs") {
    val rng = new Random(97)
    (1 to 8).foreach { i =>
      val g = TestGraphs.randomConnected(rng, 6, 2, 2, 2, id = i)
      val db = new GraphDb(IndexedSeq(g))
      val expected = TestGraphs.bruteForceSubgraphs(g, 3).keySet
      val got = enumerate(db, 3).map(_.key)
      assert(got.toSet == expected, s"iteration $i on $g")
      assert(got.distinct.length == got.length, s"duplicates at iteration $i")
    }
  }

  test("enumeration over a database unions per-graph pattern sets") {
    val db = SampleDb.db
    val expected = db.graphs
      .flatMap(g => TestGraphs.bruteForceSubgraphs(g, 2).keySet)
      .toSet
    val got = enumerate(db, 2).map(_.key).toSet
    assert(got == expected)
  }

  test("cover sets agree with the independent SubIso path") {
    val db = SampleDb.db
    enumerate(db, 3).foreach { node =>
      val viaIso = TestGraphs.coverViaSubIso(node.graph, db)
      assert(node.coverGlobal(db).toSet == viaIso, s"pattern ${node.key}")
    }
  }

  test("support counts distinct containing graphs") {
    val db = SampleDb.db
    val bySupport = enumerate(db, 1).map(n => n.key -> n.support).toMap
    // C-C edges appear in G1 (ring), G2 (chain) and G3 (tail) — not G4.
    val ccKey = enumerate(db, 1).find(n =>
      n.graph.vertexLabels.toSeq == Seq(SampleDb.C, SampleDb.C)).get.key
    assert(bySupport(ccKey) == 3)
  }

  test("minSupport prunes infrequent patterns and their descendants") {
    val db = SampleDb.db
    val all = enumerate(db, 3)
    val frequent = enumerate(db, 3, minSupport = 2)
    assert(frequent.map(_.key).toSet.subsetOf(all.map(_.key).toSet))
    assert(frequent.forall(_.support >= 2))
    // Anti-monotonicity: every frequent pattern of the full run is kept.
    val expectedFrequent = all.filter(_.support >= 2).map(_.key).toSet
    assert(frequent.map(_.key).toSet == expectedFrequent)
  }

  test("eMax bounds pattern size") {
    val db = SampleDb.db
    assert(enumerate(db, 2).forall(_.numEdges <= 2))
  }

  test("pattern graphs are connected") {
    assert(enumerate(SampleDb.db, 3).forall(_.graph.isConnected))
  }

  test("every enumerated code is canonical") {
    enumerate(SampleDb.db, 3).foreach { n =>
      assert(repro.graph.CanonicalCode.isMin(n.code), s"non-minimal ${n.key}")
    }
  }

  test("embeddings are valid") {
    val db = SampleDb.db
    enumerate(db, 3).foreach { n =>
      n.embeddings.foreach { emb =>
        val g = db.graphs(emb.graphIdx)
        assert(emb.vmap.distinct.length == emb.vmap.length)
        (0 until n.numEdges).foreach { e =>
          val te = g.edgeBetween(emb.vmap(n.graph.src(e)), emb.vmap(n.graph.dst(e)))
          assert(te == emb.eids(e))
        }
      }
    }
  }

  test("graphIds are sorted and distinct") {
    enumerate(SampleDb.db10, 2).foreach { n =>
      val ids = n.graphIds
      assert(ids.toSeq == ids.toSeq.distinct.sorted)
    }
  }

  test("traverse visit=false prunes the subtree") {
    val db = SampleDb.db
    var visitedAll = 0
    new Enumerator(db, 3).traverse { _ => visitedAll += 1; true }
    var visitedPruned = 0
    new Enumerator(db, 3).traverse { n => visitedPruned += 1; n.numEdges < 2 }
    assert(visitedPruned < visitedAll)
    // With pruning at 2 edges, nothing of size 3 is visited.
    var maxSize = 0
    new Enumerator(db, 3).traverse { n => maxSize = math.max(maxSize, n.numEdges); n.numEdges < 2 }
    assert(maxSize == 2)
  }

  test("deadline aborts with TedTimeout") {
    val rng = new Random(5)
    val graphs = (1 to 12).map(i => TestGraphs.randomConnected(rng, 14, 6, 2, 1, id = i))
    val db = new GraphDb(graphs)
    val en = new Enumerator(db, 10, 1, deadlineNanos = System.nanoTime() + 10000000L) // 10 ms
    intercept[TedTimeout] {
      en.collectAll()
    }
  }

  test("1-labeled path counts: path graph P4 has expected pattern counts") {
    // Unlabeled P4 (4 vertices, 3 edges): connected subgraphs = paths of
    // length 1..3: 3 + 2 + 1 = 6 subgraph occurrences, but as patterns
    // (canonical forms) they collapse to P2, P3, P4.
    val g = LabeledGraph(0, Seq(0, 0, 0, 0), Seq((0, 1, 0), (1, 2, 0), (2, 3, 0)))
    val patterns = enumerate(new GraphDb(IndexedSeq(g)), 3)
    assert(patterns.length == 3)
  }
}
