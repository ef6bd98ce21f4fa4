package repro

import org.roaringbitmap.RoaringBitmap
import repro.graph.Graph
import repro.graph.reach.ReachOps
import repro.pattern.{Direct, Pattern, Reach}

/** Independent reference implementations for correctness tests: a naive
  * BFS-based reachability matrix, a definition-level double simulation, and a
  * brute-force homomorphic pattern matcher. All are deliberately written
  * without sharing code with the production algorithms.
  */
object BruteForce {

  /** reach(u)(v) == true iff there is a path with >=1 edge from u to v. */
  def reachMatrix(g: Graph): Array[java.util.BitSet] = {
    val n = g.numNodes
    Array.tabulate(n) { u =>
      val seen = new java.util.BitSet(n)
      val stack = scala.collection.mutable.ArrayDeque[Int]()
      g.outNeighbors(u).foreach { v =>
        if (!seen.get(v)) { seen.set(v); stack.prepend(v) }
      }
      while (stack.nonEmpty) {
        val x = stack.removeHead()
        g.outNeighbors(x).foreach { v =>
          if (!seen.get(v)) { seen.set(v); stack.prepend(v) }
        }
      }
      seen
    }
  }

  /** All homomorphisms of p into g, as tuples indexed by query node id. */
  def answer(g: Graph, p: Pattern): Set[Vector[Int]] = {
    val reach = reachMatrix(g)
    val cands = (0 until p.numNodes).map(q => g.invertedListByName(p.labels(q)))
    val t = new Array[Int](p.numNodes)
    val out = scala.collection.mutable.Set.empty[Vector[Int]]
    def ok(q: Int): Boolean = p.edges.forall { e =>
      if (e.from > q || e.to > q) true
      else e.kind match {
        case Direct => g.hasEdge(t(e.from), t(e.to))
        case Reach => reach(t(e.from)).get(t(e.to))
      }
    }
    def go(q: Int): Unit = {
      if (q == p.numNodes) { out += t.toVector; return }
      cands(q).foreach { v =>
        t(q) = v
        if (ok(q)) go(q + 1)
      }
    }
    go(0)
    out.toSet
  }

  /** Definition-level double simulation fixpoint (paper Def. 1). */
  def doubleSim(g: Graph, p: Pattern): Array[Set[Int]] = {
    val reach = reachMatrix(g)
    def edgeMatch(e: repro.pattern.PEdge, u: Int, v: Int): Boolean = e.kind match {
      case Direct => g.hasEdge(u, v)
      case Reach => reach(u).get(v)
    }
    var s = (0 until p.numNodes).map(q => g.invertedListByName(p.labels(q)).toSet).toArray
    var changed = true
    while (changed) {
      changed = false
      for (q <- 0 until p.numNodes) {
        val keep = s(q).filter { v =>
          p.outEdges(q).forall(e => s(e.to).exists(v2 => edgeMatch(e, v, v2))) &&
            p.inEdges(q).forall(e => s(e.from).exists(v2 => edgeMatch(e, v2, v)))
        }
        if (keep.size != s(q).size) { s(q) = keep; changed = true }
      }
    }
    s
  }

  /** Occurrence set os(q): values appearing in column q of the answer. */
  def occurrenceSets(g: Graph, p: Pattern): Array[Set[Int]] = {
    val ans = answer(g, p)
    Array.tabulate(p.numNodes)(q => ans.map(_(q)))
  }

  def toBitmap(s: Iterable[Int]): RoaringBitmap = RoaringBitmap.bitmapOf(s.toSeq: _*)

  def bitmapToSet(b: RoaringBitmap): Set[Int] = b.toArray.toSet

  /** Convenience: ReachOps for a graph (fresh condensation). */
  def ops(g: Graph): ReachOps = ReachOps(g)
}

/** Deterministic property-style testing without the scalatestplus bridge
  * (only scalatest + scalacheck jars are available offline): run a check over
  * a fixed seed range, reporting the failing seed.
  */
trait SeededChecks {
  def forSeeds(n: Int, from: Long = 0L)(f: Long => Unit): Unit =
    (from until from + n).foreach { seed =>
      try f(seed)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"failed for seed=$seed: ${e.getMessage}", e)
      }
    }
}
