package repro.pattern

/** Hybrid graph pattern queries (paper §2, Defs 2.3–2.4).
  *
  * A pattern is a connected directed graph whose nodes carry label names and
  * whose edges are either *direct* (edge-to-edge mapping) or *reachability*
  * (edge-to-path mapping). Node ids are dense 0..n-1.
  */
sealed trait EdgeKind extends Serializable
case object Direct extends EdgeKind
case object Reach extends EdgeKind

/** One pattern edge `from -> to` with its mapping kind. */
final case class PEdge(from: Int, to: Int, kind: EdgeKind) extends Serializable

final case class Pattern(
    name: String,
    labels: Vector[String],
    edges: Vector[PEdge],
) extends Serializable {

  def numNodes: Int = labels.length
  def numEdges: Int = edges.length

  require(edges.forall(e => e.from != e.to), s"$name: self-loop pattern edges are not allowed")
  require(edges.forall(e => e.from >= 0 && e.from < numNodes && e.to >= 0 && e.to < numNodes),
    s"$name: edge endpoints out of range")
  require(edges.distinct.size == edges.size, s"$name: duplicate pattern edges")

  /** Output column name for query node q (answer DataFrame schema). */
  def colName(q: Int): String = s"q$q"

  def outEdges(q: Int): Vector[PEdge] = edges.filter(_.from == q)
  def inEdges(q: Int): Vector[PEdge] = edges.filter(_.to == q)

  /** Undirected adjacency — used by search orders and spanning trees. */
  def neighbors(q: Int): Vector[Int] =
    (edges.collect { case PEdge(`q`, t, _) => t } ++
      edges.collect { case PEdge(s, `q`, _) => s }).distinct

  def isConnected: Boolean = {
    if (numNodes == 0) return true
    val seen = scala.collection.mutable.BitSet(0)
    val stack = scala.collection.mutable.ArrayDeque(0)
    while (stack.nonEmpty) {
      val q = stack.removeHead()
      neighbors(q).foreach(p => if (seen.add(p)) stack.prepend(p))
    }
    seen.size == numNodes
  }

  /** True iff the *directed* pattern graph has no directed cycle. */
  def isDag: Boolean = topologicalOrder.isDefined

  /** Forward topological order of pattern nodes, if acyclic. */
  def topologicalOrder: Option[Vector[Int]] = {
    val indeg = Array.fill(numNodes)(0)
    edges.foreach(e => indeg(e.to) += 1)
    val queue = scala.collection.mutable.Queue.empty[Int]
    (0 until numNodes).foreach(q => if (indeg(q) == 0) queue.enqueue(q))
    val order = Vector.newBuilder[Int]
    var emitted = 0
    while (queue.nonEmpty) {
      val q = queue.dequeue()
      order += q; emitted += 1
      outEdges(q).foreach { e =>
        indeg(e.to) -= 1
        if (indeg(e.to) == 0) queue.enqueue(e.to)
      }
    }
    if (emitted == numNodes) Some(order.result()) else None
  }

  /** Splits the pattern into a dag plus back-edge set Δ (paper Alg. 3).
    * Back edges are found by a DFS over the directed pattern; removing them
    * leaves an acyclic pattern with the same node set.
    */
  def dagDecomposition: (Pattern, Vector[PEdge]) = {
    val state = Array.fill(numNodes)(0) // 0 white, 1 gray, 2 black
    val back = Vector.newBuilder[PEdge]
    val keep = Vector.newBuilder[PEdge]
    def dfs(q: Int): Unit = {
      state(q) = 1
      outEdges(q).foreach { e =>
        if (state(e.to) == 1) back += e
        else {
          keep += e
          if (state(e.to) == 0) dfs(e.to)
        }
      }
      state(q) = 2
    }
    (0 until numNodes).foreach(q => if (state(q) == 0) dfs(q))
    val backEdges = back.result()
    (copy(name = name + "-dag", edges = keep.result()), backEdges)
  }

  /** True iff the undirected version of this pattern is acyclic. */
  def isUndirectedAcyclic: Boolean = numEdges == numNodes - 1 && isConnected

  /** Number of independent undirected cycles (cyclomatic number). */
  def undirectedCycleCount: Int = numEdges - numNodes + 1

  /** Pattern class per the paper's taxonomy (§7.1). */
  def patternClass: String = {
    val complete = numEdges == numNodes * (numNodes - 1) / 2
    if (isUndirectedAcyclic) "acyclic"
    else if (complete) "clique"
    else if (undirectedCycleCount > 2) "combo"
    else "cyclic"
  }

  /** All-direct-edge variant (a C-query). */
  def toCQuery: Pattern =
    copy(name = name.replaceFirst("^[A-Z]", "C"), edges = edges.map(_.copy(kind = Direct)))

  /** All-reachability-edge variant (a D-query). */
  def toDQuery: Pattern =
    copy(name = name.replaceFirst("^[A-Z]", "D"), edges = edges.map(_.copy(kind = Reach)))
}
