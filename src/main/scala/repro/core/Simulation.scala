package repro.core

import org.roaringbitmap.RoaringBitmap
import repro.graph.reach.ReachOps
import repro.pattern.{Direct, Pattern, Reach}

/** Double simulation FB of a pattern by a data graph (paper §4.2–§4.4).
  *
  * FB is the largest relation S ⊆ V_Q × V_G such that matched nodes agree on
  * labels and every pattern edge is forward- and backward-satisfiable within
  * S, with direct edges checked against graph edges and reachability edges
  * against paths. All pruning here uses the paper's *batch* bitmap method
  * (§4.5 `bitBat`): one candidate set is intersected with the one-step or
  * closure neighborhood of another, via [[ReachOps]].
  *
  * Three algorithms are provided: [[fbSimBas]] (arbitrary edge order),
  * [[fbSimDag]] (topological passes, dag patterns only) and [[fbSim]]
  * (dag + Δ back edges, any pattern). `maxPasses` implements the paper's
  * convergence cut-off (fixed to 3 in their experiments); pruning is always
  * sound, so a truncated run still yields a valid RIG search space.
  */
object Simulation {

  final case class Result(fb: Array[RoaringBitmap], passes: Int) {
    def isEmpty: Boolean = fb.exists(_.isEmpty)
    def cardinalities: Array[Int] = fb.map(_.getCardinality)
  }

  /** Initial candidate sets: the match sets ms(q) (label inverted lists). */
  def matchSets(ops: ReachOps, p: Pattern): Array[RoaringBitmap] =
    Array.tabulate(p.numNodes) { q =>
      ops.g.labelId(p.labels(q)) match {
        case Some(l) => ops.g.invertedBitmap(l).clone()
        case None => new RoaringBitmap()
      }
    }

  /** In-place: keep only tail candidates with a forward match over `e`.
    * Returns true iff FB(e.from) shrank.
    */
  private def pruneTail(ops: ReachOps, fb: Array[RoaringBitmap], e: repro.pattern.PEdge): Boolean = {
    val allowed = e.kind match {
      case Direct => ops.predsOf(fb(e.to))
      case Reach => ops.ancestorsOf(fb(e.to))
    }
    val before = fb(e.from).getCardinality
    fb(e.from).and(allowed)
    fb(e.from).getCardinality != before
  }

  /** In-place: keep only head candidates with a backward match over `e`. */
  private def pruneHead(ops: ReachOps, fb: Array[RoaringBitmap], e: repro.pattern.PEdge): Boolean = {
    val allowed = e.kind match {
      case Direct => ops.succsOf(fb(e.from))
      case Reach => ops.descendantsOf(fb(e.from))
    }
    val before = fb(e.to).getCardinality
    fb(e.to).and(allowed)
    fb(e.to).getCardinality != before
  }

  /** Algorithm 1 (FBSimBas): arbitrary edge order, forward sweep then
    * backward sweep, until stable (or `maxPasses`).
    */
  def fbSimBas(ops: ReachOps, p: Pattern, init: Array[RoaringBitmap],
               maxPasses: Int = Int.MaxValue): Result = {
    val fb = init.map(_.clone())
    var passes = 0
    var changed = true
    while (changed && passes < maxPasses && !fb.exists(_.isEmpty)) {
      changed = false
      p.edges.foreach(e => changed |= pruneTail(ops, fb, e))
      p.edges.foreach(e => changed |= pruneHead(ops, fb, e))
      passes += 1
    }
    Result(normalizeEmpty(fb), passes)
  }

  /** Algorithm 2 (FBSimDag): bottom-up (reverse topological) forward pass,
    * then top-down backward pass, until stable. Dag patterns only.
    *
    * The per-node dirty flags implement the paper's first convergence tuning:
    * an edge is re-checked in a pass only if one of its endpoint sets shrank
    * in the previous pass.
    */
  def fbSimDag(ops: ReachOps, p: Pattern, init: Array[RoaringBitmap],
               maxPasses: Int = Int.MaxValue): Result = {
    val topo = p.topologicalOrder.getOrElse(
      throw new IllegalArgumentException(s"${p.name} is not a dag"))
    val fb = init.map(_.clone())
    var passes = 0
    var changed = true
    val dirtyPrev = Array.fill(p.numNodes)(true)
    while (changed && passes < maxPasses && !fb.exists(_.isEmpty)) {
      changed = false
      val dirtyNow = Array.fill(p.numNodes)(false)
      topo.reverse.foreach { q =>
        p.outEdges(q).foreach { e =>
          if (dirtyPrev(e.from) || dirtyPrev(e.to) || dirtyNow(e.to))
            if (pruneTail(ops, fb, e)) { changed = true; dirtyNow(e.from) = true }
        }
      }
      topo.foreach { q =>
        p.inEdges(q).foreach { e =>
          if (dirtyPrev(e.from) || dirtyPrev(e.to) || dirtyNow(e.from) || dirtyNow(e.to))
            if (pruneHead(ops, fb, e)) { changed = true; dirtyNow(e.to) = true }
        }
      }
      System.arraycopy(dirtyNow, 0, dirtyPrev, 0, p.numNodes)
      passes += 1
    }
    Result(normalizeEmpty(fb), passes)
  }

  /** Algorithm 3 (FBSim, "dag + Δ"): run dag passes on the acyclic core and
    * basic passes on the back-edge set Δ, iterating to a joint fixpoint.
    */
  def fbSim(ops: ReachOps, p: Pattern, init: Array[RoaringBitmap],
            maxPasses: Int = Int.MaxValue): Result = {
    if (p.isDag) return fbSimDag(ops, p, init, maxPasses)
    val (dagPart, backEdges) = p.dagDecomposition
    var fb = init.map(_.clone())
    var passes = 0
    var changed = true
    while (changed && passes < maxPasses && !fb.exists(_.isEmpty)) {
      changed = false
      val dagRes = fbSimDag(ops, dagPart, fb, maxPasses = 1)
      if (!sameCards(fb, dagRes.fb)) changed = true
      fb = dagRes.fb
      backEdges.foreach { e =>
        changed |= pruneTail(ops, fb, e)
        changed |= pruneHead(ops, fb, e)
      }
      passes += 1
    }
    Result(normalizeEmpty(fb), passes)
  }

  private def sameCards(a: Array[RoaringBitmap], b: Array[RoaringBitmap]): Boolean =
    a.indices.forall(i => a(i).getCardinality == b(i).getCardinality)

  /** If any candidate set is empty the query answer is empty — clear all sets
    * so callers see an empty RIG (the paper's early-termination property).
    */
  private def normalizeEmpty(fb: Array[RoaringBitmap]): Array[RoaringBitmap] =
    if (fb.exists(_.isEmpty)) fb.map(_ => new RoaringBitmap()) else fb

  /** Node pre-filtering of [11, 63] as used by JM/TM and GM-F: a single
    * non-iterated forward+backward sweep over the edges (prunes candidates
    * with no matching partner per adjacent edge, but does not iterate to the
    * simulation fixpoint).
    */
  def prefilter(ops: ReachOps, p: Pattern): Array[RoaringBitmap] =
    fbSimBas(ops, p, matchSets(ops, p), maxPasses = 1).fb
}
