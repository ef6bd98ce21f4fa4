package repro.core

import org.apache.spark.sql.SparkSession
import org.roaringbitmap.RoaringBitmap
import repro.graph.reach.ReachOps
import repro.pattern.{Direct, Pattern, Reach}

/** Runtime Index Graph (paper §4, Def. 4.1).
  *
  * A k-partite graph over candidate occurrence sets `cos(q)` (one independent
  * set per query node) whose edge sets `cos(e)` sandwich the answer:
  * `os(e) ⊆ cos(e) ⊆ ms(e)`. Adjacency inside the RIG is indexed by query
  * edge so MJoin can multi-way intersect adjacency lists (§5).
  *
  * @param cos    per query node: sorted candidate node ids
  * @param fwdAdj per pattern edge index: for each position in cos(e.from),
  *               the sorted successors within cos(e.to)
  * @param bwdAdj per pattern edge index: for each position in cos(e.to),
  *               the sorted predecessors within cos(e.from)
  */
final class RIG(
    val pattern: Pattern,
    val cos: Array[Array[Int]],
    val fwdAdj: Array[Array[Array[Int]]],
    val bwdAdj: Array[Array[Array[Int]]],
) extends Serializable {

  def numNodes: Long = cos.map(_.length.toLong).sum
  def numEdges: Long = fwdAdj.map(_.map(_.length.toLong).sum).sum
  def size: Long = numNodes + numEdges
  def isEmpty: Boolean = cos.exists(_.isEmpty)

  /** Position of node id `v` inside cos(q), or -1. */
  def posIn(q: Int, v: Int): Int = {
    val i = java.util.Arrays.binarySearch(cos(q), v)
    if (i >= 0) i else -1
  }

  /** Successors of `v` (a member of cos(edge.from)) across pattern edge `e`. */
  def successors(e: Int, v: Int): Array[Int] = {
    val pos = posIn(pattern.edges(e).from, v)
    if (pos < 0) Array.emptyIntArray else fwdAdj(e)(pos)
  }

  /** Predecessors of `v` (a member of cos(edge.to)) across pattern edge `e`. */
  def predecessors(e: Int, v: Int): Array[Int] = {
    val pos = posIn(pattern.edges(e).to, v)
    if (pos < 0) Array.emptyIntArray else bwdAdj(e)(pos)
  }
}

/** Algorithm 4 (BuildRIG): node selection via double simulation, then node
  * expansion with incident edges. Direct edges expand by intersecting graph
  * adjacency rows with cos(q) (the paper's `bitBat`); reachability edges
  * expand through [[ReachOps.TargetedReach]] (condensation-DFS with region
  * pruning and per-SCC memoization). When a SparkSession is supplied and a
  * side is large, the expansion fans out over executors with the CSR and the
  * candidate sets shipped via broadcast — the distributed-dataflow face of
  * the paper's on-the-fly index build.
  */
object RIG {

  /** Build the RIG edges over already-selected candidate sets. */
  def expand(ops: ReachOps, p: Pattern, cosSets: Array[RoaringBitmap],
             spark: Option[SparkSession] = None,
             distributeThreshold: Int = 4096): RIG = {
    val cos: Array[Array[Int]] = cosSets.map(_.toArray)
    if (cos.exists(_.isEmpty)) {
      val empty = p.edges.indices.map(_ => Array.empty[Array[Int]]).toArray
      return new RIG(p, cos.map(_ => Array.emptyIntArray), empty, empty)
    }

    val fwd = new Array[Array[Array[Int]]](p.numEdges)
    for (ei <- p.edges.indices) {
      val e = p.edges(ei)
      val sources = cos(e.from)
      val targets = cos(e.to)
      val targetSet = cosSets(e.to)
      def expandLocal(src: Array[Int]): Array[Array[Int]] = e.kind match {
        case Direct =>
          src.map { vp =>
            // adj_f(vp) ∩ cos(q): both sorted — stream the smaller through.
            val g = ops.g
            val out = new scala.collection.mutable.ArrayBuffer[Int]()
            var i = g.fwdOff(vp)
            while (i < g.fwdOff(vp + 1)) {
              val w = g.fwdAdj(i)
              if (targetSet.contains(w)) out += w
              i += 1
            }
            out.toArray
          }
        case Reach =>
          val tr = ops.targeted(targets)
          src.map(tr.from)
      }
      fwd(ei) = spark match {
        case Some(ss) if sources.length >= distributeThreshold =>
          val sc = ss.sparkContext
          val bOps = sc.broadcast(ops)
          val bTargets = sc.broadcast(targets)
          val bTargetSet = sc.broadcast(targetSet)
          val kind = e.kind
          val parts = math.min(sc.defaultParallelism * 2, math.max(1, sources.length / 256))
          val res = sc.parallelize(sources.toIndexedSeq, parts)
            .mapPartitions { it =>
              val o = bOps.value
              kind match {
                case Direct =>
                  val g = o.g
                  it.map { vp =>
                    val out = new scala.collection.mutable.ArrayBuffer[Int]()
                    var i = g.fwdOff(vp)
                    while (i < g.fwdOff(vp + 1)) {
                      val w = g.fwdAdj(i)
                      if (bTargetSet.value.contains(w)) out += w
                      i += 1
                    }
                    (vp, out.toArray)
                  }
                case Reach =>
                  val tr = o.targeted(bTargets.value) // one region build per partition
                  it.map(vp => (vp, tr.from(vp)))
              }
            }
            .collect()
            .toMap
          bOps.destroy(); bTargets.destroy(); bTargetSet.destroy()
          sources.map(res)
        case _ => expandLocal(sources)
      }
    }

    // Derive backward adjacency from the forward lists.
    val bwd = new Array[Array[Array[Int]]](p.numEdges)
    for (ei <- p.edges.indices) {
      val e = p.edges(ei)
      val counts = new Array[Int](cos(e.to).length)
      val posOfTarget = new java.util.HashMap[Integer, Integer]()
      cos(e.to).zipWithIndex.foreach { case (v, i) => posOfTarget.put(v, i) }
      fwd(ei).foreach(_.foreach(v => counts(posOfTarget.get(v)) += 1))
      val lists = counts.map(new Array[Int](_))
      val fill = new Array[Int](counts.length)
      var sp = 0
      while (sp < cos(e.from).length) {
        val vp = cos(e.from)(sp)
        fwd(ei)(sp).foreach { v =>
          val tp = posOfTarget.get(v)
          lists(tp)(fill(tp)) = vp; fill(tp) += 1
        }
        sp += 1
      }
      // Source positions are visited ascending over sorted cos(from), so each
      // backward list is already sorted.
      bwd(ei) = lists
    }
    new RIG(p, cos, fwd, bwd)
  }

  /** Full BuildRIG: select (double simulation) then expand. */
  def build(ops: ReachOps, p: Pattern,
            init: Array[RoaringBitmap],
            maxPasses: Int = 3,
            spark: Option[SparkSession] = None): (RIG, Simulation.Result) = {
    val sim = Simulation.fbSim(ops, p, init, maxPasses)
    (expand(ops, p, sim.fb, spark), sim)
  }
}
