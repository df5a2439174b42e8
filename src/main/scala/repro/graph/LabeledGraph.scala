package repro.graph

/** An immutable small/medium labeled simple graph (a "data graph" of the
  * database, or a pattern). Undirected, connected by convention (patterns
  * are always connected; generators only emit connected graphs).
  *
  * Vertices are `0 until numVertices` with integer labels (atom ids in the
  * molecule generator). Edges are parallel arrays `src/dst/edgeLabels`;
  * edge ids are positions in those arrays. Adjacency is a CSR built once
  * at construction.
  *
  * For vertex-labeled / edge-unlabeled databases the paper (footnote 5)
  * derives an edge label from the endpoint labels; since every DFS-code
  * tuple already carries both endpoint labels, we store label 0 for such
  * databases — the derived label adds no discriminating power.
  */
final class LabeledGraph(
    val id: Long,
    val vertexLabels: Array[Int],
    val src: Array[Int],
    val dst: Array[Int],
    val edgeLabels: Array[Int],
) extends Serializable {

  val numVertices: Int = vertexLabels.length
  val numEdges: Int    = src.length
  require(dst.length == numEdges && edgeLabels.length == numEdges,
    s"parallel edge arrays disagree: ${src.length}/${dst.length}/${edgeLabels.length}")

  // CSR adjacency: vertex v's incident (neighbor, edgeId) pairs live at
  // positions adjStart(v) until adjStart(v+1) of adjVert/adjEdge.
  private val adjStart: Array[Int] = new Array[Int](numVertices + 1)
  private val adjVert: Array[Int]  = new Array[Int](numEdges * 2)
  private val adjEdge: Array[Int]  = new Array[Int](numEdges * 2)
  locally {
    val deg = new Array[Int](numVertices)
    var e = 0
    while (e < numEdges) {
      require(src(e) != dst(e), s"self loop at edge $e of graph $id")
      deg(src(e)) += 1; deg(dst(e)) += 1
      e += 1
    }
    var v = 0
    while (v < numVertices) { adjStart(v + 1) = adjStart(v) + deg(v); v += 1 }
    val fill = java.util.Arrays.copyOf(adjStart, numVertices)
    e = 0
    while (e < numEdges) {
      val u = src(e); val w = dst(e)
      adjVert(fill(u)) = w; adjEdge(fill(u)) = e; fill(u) += 1
      adjVert(fill(w)) = u; adjEdge(fill(w)) = e; fill(w) += 1
      e += 1
    }
  }

  def vertexLabel(v: Int): Int = vertexLabels(v)
  def edgeLabel(e: Int): Int   = edgeLabels(e)
  def degree(v: Int): Int      = adjStart(v + 1) - adjStart(v)

  /** Visit each incident (neighborVertex, edgeId) of `v`. */
  @inline def foreachNeighbor(v: Int)(f: (Int, Int) => Unit): Unit = {
    var i = adjStart(v)
    val end = adjStart(v + 1)
    while (i < end) { f(adjVert(i), adjEdge(i)); i += 1 }
  }

  /** Edge id between `u` and `v`, or -1 if absent. Scans the smaller
    * adjacency list; degrees are tiny (molecule valence <= 4).
    */
  def edgeBetween(u: Int, v: Int): Int = {
    val (a, b) = if (degree(u) <= degree(v)) (u, v) else (v, u)
    var i = adjStart(a)
    val end = adjStart(a + 1)
    while (i < end) {
      if (adjVert(i) == b) return adjEdge(i)
      i += 1
    }
    -1
  }

  def hasEdge(u: Int, v: Int): Boolean = edgeBetween(u, v) >= 0

  /** True iff every vertex is reachable from vertex 0 (and the graph is
    * non-empty). Generators and codecs assert this.
    */
  def isConnected: Boolean = {
    if (numVertices == 0) return false
    val seen = new Array[Boolean](numVertices)
    var stack = List(0)
    seen(0) = true
    var count = 1
    while (stack.nonEmpty) {
      val v = stack.head; stack = stack.tail
      foreachNeighbor(v) { (w, _) =>
        if (!seen(w)) { seen(w) = true; count += 1; stack = w :: stack }
      }
    }
    count == numVertices
  }

  /** Multiset check used by tests: same labeled vertex/edge statistics. */
  def labelSignature: (Seq[Int], Seq[(Int, Int, Int)]) = {
    val vs = vertexLabels.toSeq.sorted
    val es = (0 until numEdges).map { e =>
      val lu = vertexLabels(src(e)); val lv = vertexLabels(dst(e))
      (math.min(lu, lv), math.max(lu, lv), edgeLabels(e))
    }.sorted
    (vs, es)
  }

  override def toString: String =
    s"LabeledGraph(id=$id, V=$numVertices, E=$numEdges)"
}

object LabeledGraph {
  /** Convenience constructor from (u, v, edgeLabel) triples. */
  def apply(id: Long, vlabels: Seq[Int], edges: Seq[(Int, Int, Int)]): LabeledGraph =
    new LabeledGraph(
      id,
      vlabels.toArray,
      edges.map(_._1).toArray,
      edges.map(_._2).toArray,
      edges.map(_._3).toArray,
    )

  /** Edge-unlabeled convenience constructor (label 0 everywhere). */
  def unlabeledEdges(id: Long, vlabels: Seq[Int], edges: Seq[(Int, Int)]): LabeledGraph =
    apply(id, vlabels, edges.map { case (u, v) => (u, v, 0) })
}
