package repro.cover

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestGraphs
import repro.data.SampleDb
import repro.graph.{CodeEdge, GraphDb}

class PesIndexSpec extends AnyFunSuite {

  /** Synthetic "pattern" codes — the index never inspects code structure,
    * only uses keys, so opaque one-edge codes with distinct labels do.
    */
  private def code(n: Int): Vector[CodeEdge] = Vector(CodeEdge(0, 1, n, n, n))
  private def key(n: Int): String = repro.graph.DfsCode.key(code(n))

  private def newIndex(k: Int = 3, db: GraphDb = SampleDb.db) = new PesIndex(k, db)

  private def assertConsistent(pes: PesIndex): Unit = {
    val (total, priv, unc) = pes.naiveRecompute()
    assert(pes.totalCoverage == total, "totalCoverage drifted")
    priv.foreach { case (slot, v) =>
      assert(pes.privateCoverage(slot) == v, s"pCov($slot) drifted")
    }
    assert(pes.uncovered.toSeq == unc.toSeq, "uncovered counts drifted")
  }

  test("insert into empty index sets total and private coverage") {
    val pes = newIndex()
    pes.insert(code(1), key(1), Array(0, 1, 2))
    assert(pes.totalCoverage == 3)
    assert(pes.privateCoverage(0) == 3)
    assert(pes.size == 1)
    assertConsistent(pes)
  }

  test("overlapping insert demotes private edges") {
    val pes = newIndex()
    val s1 = pes.insert(code(1), key(1), Array(0, 1, 2))
    val s2 = pes.insert(code(2), key(2), Array(2, 3))
    assert(pes.totalCoverage == 4)
    assert(pes.privateCoverage(s1) == 2) // edge 2 now shared
    assert(pes.privateCoverage(s2) == 1)
    assertConsistent(pes)
  }

  test("benefit counts only uncovered edges") {
    val pes = newIndex()
    pes.insert(code(1), key(1), Array(0, 1, 2))
    assert(pes.benefit(Array(1, 2, 3, 4)) == 2)
    assert(pes.benefit(Array(0, 1)) == 0)
    assert(pes.benefit(Array(10, 11)) == 2)
  }

  test("minLoss selects the slot with smallest private coverage") {
    val pes = newIndex()
    val s1 = pes.insert(code(1), key(1), Array(0, 1, 2, 3))
    val s2 = pes.insert(code(2), key(2), Array(5))
    val (loss, slot) = pes.minLoss
    assert(loss == 1 && slot == s2)
    assert(s1 != s2)
  }

  test("delete restores coverage and promotes shared edges to private") {
    val pes = newIndex()
    val s1 = pes.insert(code(1), key(1), Array(0, 1, 2))
    val s2 = pes.insert(code(2), key(2), Array(2, 3))
    pes.delete(s2)
    assert(pes.size == 1)
    assert(pes.totalCoverage == 3)
    assert(pes.privateCoverage(s1) == 3) // edge 2 exclusively owned again
    assertConsistent(pes)
  }

  test("update swaps a pattern in place") {
    val pes = newIndex()
    pes.insert(code(1), key(1), Array(0, 1))
    val (_, slot) = pes.minLoss
    pes.update(slot, code(9), key(9), Array(5, 6, 7))
    assert(pes.size == 1)
    assert(pes.totalCoverage == 3)
    assert(!pes.contains(key(1)) && pes.contains(key(9)))
    assertConsistent(pes)
  }

  test("uncovered per-graph counts track rCov zero-transitions") {
    val db = SampleDb.db // G1 has 8 edges at offset 0
    val pes = newIndex(3, db)
    assert(pes.uncovered(0) == 8)
    pes.insert(code(1), key(1), Array(0, 1, 2))
    assert(pes.uncovered(0) == 5)
    pes.insert(code(2), key(2), Array(2, 3, db.edgeOffset(1)))
    assert(pes.uncovered(0) == 4)
    assert(pes.uncovered(1) == db.graphs(1).numEdges - 1)
    pes.delete(pes.minLoss._2)
    assertConsistent(pes)
  }

  test("isCovered reflects the live pattern set") {
    val pes = newIndex()
    val s = pes.insert(code(1), key(1), Array(4))
    assert(pes.isCovered(4) && !pes.isCovered(5))
    pes.delete(s)
    assert(!pes.isCovered(4))
  }

  test("contains/slotOf by code key") {
    val pes = newIndex()
    val s = pes.insert(code(7), key(7), Array(0))
    assert(pes.contains(key(7)))
    assert(pes.slotOf(key(7)).contains(s))
    assert(!pes.contains(key(8)))
  }

  test("insert past capacity is rejected") {
    val pes = newIndex(2)
    pes.insert(code(1), key(1), Array(0))
    pes.insert(code(2), key(2), Array(1))
    intercept[IllegalArgumentException] {
      pes.insert(code(3), key(3), Array(2))
    }
  }

  test("duplicate insert is rejected") {
    val pes = newIndex()
    pes.insert(code(1), key(1), Array(0))
    intercept[IllegalArgumentException] {
      pes.insert(code(1), key(1), Array(1))
    }
  }

  test("maintenance time accumulates") {
    val pes = newIndex()
    pes.insert(code(1), key(1), Array.tabulate(10)(identity))
    assert(pes.maintenanceNanos > 0)
  }

  test("sizeBytes grows with covered edges and shrinks on delete") {
    val pes = newIndex()
    val empty = pes.sizeBytes
    val s = pes.insert(code(1), key(1), Array.tabulate(10)(identity))
    val after = pes.sizeBytes
    assert(after > empty)
    pes.delete(s)
    assert(pes.sizeBytes < after)
  }

  test("randomized insert/delete/update stays consistent with naive recomputation") {
    val rng = new Random(13)
    val db = SampleDb.db10
    val pes = new PesIndex(5, db)
    var nextCode = 0
    (1 to 200).foreach { _ =>
      val op = rng.nextInt(3)
      if (op == 0 && pes.size < 5) {
        nextCode += 1
        val cover = Array.fill(1 + rng.nextInt(12))(rng.nextInt(db.totalEdges)).distinct.sorted
        pes.insert(code(nextCode), key(nextCode), cover)
      } else if (op == 1 && pes.size > 0) {
        val slots = pes.patternSlots
        pes.delete(slots(rng.nextInt(slots.length)))
      } else if (pes.size > 0) {
        nextCode += 1
        val cover = Array.fill(1 + rng.nextInt(12))(rng.nextInt(db.totalEdges)).distinct.sorted
        pes.update(pes.minLoss._2, code(nextCode), key(nextCode), cover)
      }
      assertConsistent(pes)
      if (pes.size > 0) {
        val (loss, slot) = pes.minLoss
        assert(loss == pes.privateCoverage(slot))
        assert(pes.patternSlots.forall(s => pes.privateCoverage(s) >= loss))
      }
    }
  }

  test("example-4 style swap arithmetic") {
    // P = {p_a, p_b, p_c} with private coverages 2, 10, 8; Score_L = 2.
    val db = SampleDb.db10
    val pes = new PesIndex(3, db)
    pes.insert(code(1), key(1), Array(0, 1))                         // private 2
    pes.insert(code(2), key(2), Array.tabulate(10)(_ + 2))           // private 10
    pes.insert(code(3), key(3), Array.tabulate(8)(_ + 12))           // private 8
    val (loss, slot) = pes.minLoss
    assert(loss == 2 && slot == 0)
    // Candidate g with benefit 7 (7 new edges): swap since 7 > (1+1)*2.
    val cand = Array.tabulate(7)(_ + 20)
    val b = pes.benefit(cand)
    assert(b == 7)
    assert(b > 2 * loss)
    pes.update(slot, code(4), key(4), cand)
    assert(pes.totalCoverage == 10 + 8 + 7)
    assertConsistent(pes)
  }
}
