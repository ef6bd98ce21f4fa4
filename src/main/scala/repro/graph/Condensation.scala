package repro.graph

import scala.collection.mutable

/** Strongly-connected-component condensation of a [[Graph]].
  *
  * Reachability indexes (BFL, intervals) operate on the condensation DAG:
  * within an SCC every node reaches every other, across SCCs reachability is
  * the DAG's. Components are numbered in **reverse topological order of
  * discovery inverted to a forward topological order**: `comp(u) < comp(v)`
  * implies v does not reach u across components — i.e. component ids are a
  * topological order of the condensation DAG.
  */
final class Condensation(
    /** node id -> component id (component ids are topologically ordered). */
    val comp: Array[Int],
    /** number of components. */
    val numComps: Int,
    /** component -> size (number of member nodes). */
    val compSize: Array[Int],
    /** condensation DAG, forward CSR over component ids (deduplicated). */
    val dagOff: Array[Int],
    val dagAdj: Array[Int],
    /** condensation DAG, backward CSR. */
    val dagBwdOff: Array[Int],
    val dagBwdAdj: Array[Int],
    /** component -> sorted member node ids (CSR). */
    val memberOff: Array[Int],
    val memberAdj: Array[Int],
) extends Serializable {

  /** True iff the component contains a directed cycle (size >= 2; the input
    * graphs carry no self-loops, see [[Graph.fromEdges]]).
    */
  def isCyclic(c: Int): Boolean = compSize(c) >= 2

  def members(c: Int): IndexedSeq[Int] =
    (memberOff(c) until memberOff(c + 1)).map(memberAdj)

  def dagChildren(c: Int): IndexedSeq[Int] =
    (dagOff(c) until dagOff(c + 1)).map(dagAdj)

  def dagParents(c: Int): IndexedSeq[Int] =
    (dagBwdOff(c) until dagBwdOff(c + 1)).map(dagBwdAdj)
}

object Condensation {

  /** Iterative Tarjan SCC (explicit stack — the data graphs reach 10^6 nodes,
    * far beyond JVM recursion depth).
    */
  def apply(g: Graph): Condensation = {
    val n = g.numNodes
    val index = Array.fill(n)(-1)
    val lowlink = new Array[Int](n)
    val onStack = new Array[Boolean](n)
    val stack = new mutable.ArrayDeque[Int]()
    var nextIndex = 0
    var compCount = 0
    val compRaw = Array.fill(n)(-1)

    // Explicit DFS state: node + position in its adjacency row.
    val dfsNode = new Array[Int](n + 1)
    val dfsEdge = new Array[Int](n + 1)

    var root = 0
    while (root < n) {
      if (index(root) == -1) {
        var top = 0
        dfsNode(0) = root; dfsEdge(0) = g.fwdOff(root)
        index(root) = nextIndex; lowlink(root) = nextIndex; nextIndex += 1
        stack.prepend(root); onStack(root) = true
        while (top >= 0) {
          val u = dfsNode(top)
          if (dfsEdge(top) < g.fwdOff(u + 1)) {
            val v = g.fwdAdj(dfsEdge(top)); dfsEdge(top) += 1
            if (index(v) == -1) {
              index(v) = nextIndex; lowlink(v) = nextIndex; nextIndex += 1
              stack.prepend(v); onStack(v) = true
              top += 1; dfsNode(top) = v; dfsEdge(top) = g.fwdOff(v)
            } else if (onStack(v) && index(v) < lowlink(u)) {
              lowlink(u) = index(v)
            }
          } else {
            if (lowlink(u) == index(u)) {
              var w = -1
              while (w != u) {
                w = stack.removeHead(); onStack(w) = false
                compRaw(w) = compCount
              }
              compCount += 1
            }
            top -= 1
            if (top >= 0) {
              val p = dfsNode(top)
              if (lowlink(u) < lowlink(p)) lowlink(p) = lowlink(u)
            }
          }
        }
      }
      root += 1
    }

    // Tarjan emits components in *reverse* topological order; flip ids so that
    // component ids form a forward topological order of the condensation DAG.
    val comp = new Array[Int](n)
    var i = 0
    while (i < n) { comp(i) = compCount - 1 - compRaw(i); i += 1 }

    val compSize = new Array[Int](compCount)
    i = 0
    while (i < n) { compSize(comp(i)) += 1; i += 1 }

    // Condensation DAG edges (dedup via sort-unique).
    val rawDagEdges = mutable.ArrayBuffer.empty[Long]
    i = 0
    while (i < n) {
      val cu = comp(i)
      g.outNeighbors(i).foreach { v =>
        val cv = comp(v)
        if (cu != cv) rawDagEdges += (cu.toLong << 32) | (cv.toLong & 0xffffffffL)
      }
      i += 1
    }
    val dag = rawDagEdges.distinct.toArray
    java.util.Arrays.sort(dag)
    val dagOff = new Array[Int](compCount + 1)
    val dagBwdCnt = new Array[Int](compCount + 1)
    dag.foreach { e =>
      dagOff(((e >>> 32).toInt) + 1) += 1
      dagBwdCnt((e & 0xffffffffL).toInt + 1) += 1
    }
    i = 0
    while (i < compCount) { dagOff(i + 1) += dagOff(i); dagBwdCnt(i + 1) += dagBwdCnt(i); i += 1 }
    val dagAdj = new Array[Int](dag.length)
    val dagBwdAdj = new Array[Int](dag.length)
    val fp = dagOff.clone(); val bp = dagBwdCnt.clone()
    dag.foreach { e =>
      val cu = (e >>> 32).toInt; val cv = (e & 0xffffffffL).toInt
      dagAdj(fp(cu)) = cv; fp(cu) += 1
      dagBwdAdj(bp(cv)) = cu; bp(cv) += 1
    }
    i = 0
    while (i < compCount) {
      java.util.Arrays.sort(dagBwdAdj, dagBwdCnt(i), dagBwdCnt(i + 1))
      i += 1
    }

    // component -> member CSR
    val memberOff = new Array[Int](compCount + 1)
    i = 0
    while (i < n) { memberOff(comp(i) + 1) += 1; i += 1 }
    i = 0
    while (i < compCount) { memberOff(i + 1) += memberOff(i); i += 1 }
    val memberAdj = new Array[Int](n)
    val mp = memberOff.clone()
    i = 0
    while (i < n) { memberAdj(mp(comp(i))) = i; mp(comp(i)) += 1; i += 1 }

    new Condensation(comp, compCount, compSize, dagOff, dagAdj, dagBwdCnt, dagBwdAdj,
      memberOff, memberAdj)
  }
}
