package repro.cover

import scala.collection.mutable
import repro.graph.{CodeEdge, GraphDb}

/** The Private-Edge-Set index of Section 4.2, holding the five components
  * |Cov(P)|, |pCov(p)|, rCov(e), rCnt(i) and p_min, with the INSERT /
  * DELETE / UPDATE / SELECT operations.
  *
  * Patterns occupy slots 0..k-1 (k <= 64), so the reverse cover set
  * rCov(e) is a Long bitmask per global edge. rCnt is a TreeMap from
  * private-coverage value to the slots at that value, making SELECT of
  * p_min (minimum loss score) a first-entry lookup.
  *
  * Beyond the paper, the index also maintains the per-graph uncovered-edge
  * count needed by the PRM rules (Definition 7) — a transition of rCov(e)
  * between zero and non-zero adjusts `uncovered(graphOf(e))`.
  *
  * Every mutating/scoring entry point is wrapped with nano timing so Table
  * 4's "Index Time" is measured, and `sizeBytes` reports the logical
  * (sparse) footprint for Table 3.
  */
final class PesIndex(val k: Int, val db: GraphDb) {
  require(k >= 1 && k <= 64, s"PES-Index supports 1..64 pattern slots, got $k")

  private val rCov = new Array[Long](db.totalEdges)
  private val slotUsed  = new Array[Boolean](k)
  private val slotCover = new Array[Array[Int]](k)
  private val slotCode  = new Array[Vector[CodeEdge]](k)
  private val pCov = new Array[Int](k)
  private val rCnt = new java.util.TreeMap[Int, mutable.LinkedHashSet[Int]]()
  private val codes = mutable.Map.empty[String, Int] // code key -> slot

  /** |Cov(P, D)|: total edges of D covered by the current pattern set. */
  var totalCoverage: Int = 0

  /** uncovered(i) = |E(G_i) \ Cov(P, G_i)| — the PRM bound ingredient. */
  val uncovered: Array[Int] = Array.tabulate(db.numGraphs)(i => db.graphs(i).numEdges)

  /** Cumulative time spent maintaining/querying the index (Table 4). */
  var maintenanceNanos: Long = 0L

  private var nonzeroRCov: Int = 0

  @inline private def timed[A](body: => A): A = {
    val t0 = System.nanoTime()
    val r = body
    maintenanceNanos += System.nanoTime() - t0
    r
  }

  def size: Int = codes.size
  def isFull: Boolean = size == k
  def contains(codeKey: String): Boolean = codes.contains(codeKey)
  def slotOf(codeKey: String): Option[Int] = codes.get(codeKey)

  def patternSlots: Seq[Int] = (0 until k).filter(slotUsed)
  def codeAt(slot: Int): Vector[CodeEdge] = slotCode(slot)
  def coverAt(slot: Int): Array[Int] = slotCover(slot)
  def privateCoverage(slot: Int): Int = pCov(slot)

  /** Edge-level membership: is global edge `e` covered by any pattern? */
  def isCovered(e: Int): Boolean = rCov(e) != 0L

  private def rcntAdd(slot: Int, value: Int): Unit =
    rCnt.computeIfAbsent(value, _ => mutable.LinkedHashSet.empty) += slot

  private def rcntRemove(slot: Int, value: Int): Unit = {
    val bucket = rCnt.get(value)
    bucket -= slot
    if (bucket.isEmpty) rCnt.remove(value)
  }

  private def rcntMove(slot: Int, from: Int, to: Int): Unit = {
    rcntRemove(slot, from); rcntAdd(slot, to)
  }

  /** SELECT: the pattern p_min with minimum private coverage, as
    * (lossScore, slot) — Score_L = |pCov(p_min)| (Section 4.2).
    */
  def minLoss: (Int, Int) = timed {
    require(!rCnt.isEmpty, "minLoss on an empty pattern set")
    val e = rCnt.firstEntry()
    (e.getKey, e.getValue.head)
  }

  /** Benefit score of a candidate cover set: |{e in cov : rCov(e) = 0}|. */
  def benefit(cover: Array[Int]): Int = timed {
    var b = 0
    var i = 0
    while (i < cover.length) { if (rCov(cover(i)) == 0L) b += 1; i += 1 }
    b
  }

  /** INSERT: add pattern `code` with cover set `cover` into a free slot. */
  def insert(code: Vector[CodeEdge], codeKey: String, cover: Array[Int]): Int = timed {
    require(size < k, "INSERT on a full pattern set — use update")
    require(!codes.contains(codeKey), s"pattern already present: $codeKey")
    val slot = (0 until k).find(s => !slotUsed(s)).get
    slotUsed(slot) = true
    slotCover(slot) = cover
    slotCode(slot) = code
    codes(codeKey) = slot
    var priv = 0
    val bit = 1L << slot
    var i = 0
    while (i < cover.length) {
      val e = cover(i)
      val old = rCov(e)
      if (old == 0L) {
        totalCoverage += 1
        nonzeroRCov += 1
        uncovered(db.graphOfEdge(e)) -= 1
        priv += 1
      } else if (java.lang.Long.bitCount(old) == 1) {
        val p = java.lang.Long.numberOfTrailingZeros(old)
        rcntMove(p, pCov(p), pCov(p) - 1)
        pCov(p) -= 1
      }
      rCov(e) = old | bit
      i += 1
    }
    pCov(slot) = priv
    rcntAdd(slot, priv)
    slot
  }

  /** DELETE: remove the pattern at `slot`, restoring private coverage of
    * newly-exclusive owners and the per-graph uncovered counts.
    */
  def delete(slot: Int): Unit = timed {
    require(slotUsed(slot), s"DELETE on empty slot $slot")
    val cover = slotCover(slot)
    val bit = 1L << slot
    var i = 0
    while (i < cover.length) {
      val e = cover(i)
      val now = rCov(e) & ~bit
      rCov(e) = now
      if (now == 0L) {
        totalCoverage -= 1
        nonzeroRCov -= 1
        uncovered(db.graphOfEdge(e)) += 1
      } else if (java.lang.Long.bitCount(now) == 1) {
        val p = java.lang.Long.numberOfTrailingZeros(now)
        rcntMove(p, pCov(p), pCov(p) + 1)
        pCov(p) += 1
      }
      i += 1
    }
    rcntRemove(slot, pCov(slot))
    codes.remove(repro.graph.DfsCode.key(slotCode(slot)))
    slotUsed(slot) = false
    slotCover(slot) = null
    slotCode(slot) = null
    pCov(slot) = 0
  }

  /** UPDATE: swap `code` in for the pattern at `slot` (DELETE + INSERT). */
  def update(slot: Int, code: Vector[CodeEdge], codeKey: String, cover: Array[Int]): Unit = {
    delete(slot)
    insert(code, codeKey, cover)
  }

  /** Logical (sparse) index footprint in bytes for Table 3: one
    * (edgeId, mask) entry per covered edge, the per-pattern cover lists,
    * and the scalar components.
    */
  def sizeBytes: Long = {
    var coverBytes = 0L
    var s = 0
    while (s < k) { if (slotUsed(s)) coverBytes += 4L * slotCover(s).length; s += 1 }
    12L * nonzeroRCov + coverBytes + 8L * k + 12L * rCnt.size + 16L
  }

  /** Naive recomputation of every component — the test oracle for the
    * incremental maintenance (never used on hot paths).
    */
  def naiveRecompute(): (Int, Map[Int, Int], Array[Int]) = {
    val coveredBy = mutable.Map.empty[Int, Long]
    (0 until k).filter(slotUsed).foreach { s =>
      slotCover(s).foreach(e => coveredBy(e) = coveredBy.getOrElse(e, 0L) | (1L << s))
    }
    val total = coveredBy.size
    val priv = (0 until k).filter(slotUsed).map { s =>
      s -> coveredBy.count { case (_, m) => m == (1L << s) }
    }.toMap
    val unc = Array.tabulate(db.numGraphs) { gi =>
      val lo = db.edgeOffset(gi); val hi = db.edgeOffset(gi + 1)
      (lo until hi).count(e => !coveredBy.contains(e))
    }
    (total, priv, unc)
  }
}
