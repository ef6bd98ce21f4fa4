package repro.core

import repro.pattern.Pattern

/** Search-order strategies for MJoin (paper §5.2, §7.4).
  *
  * A search order is a connected permutation of the query nodes. All three
  * strategies the paper evaluates are here:
  *   - JO: greedy on RIG candidate-set cardinalities (start at the smallest
  *     cos(q), extend with the adjacent node of smallest cos);
  *   - RI: purely topological (maximize constraints to already-ordered
  *     nodes, prefer high-degree nodes; data-graph independent);
  *   - BJ: exact left-deep plan via dynamic programming over node subsets,
  *     costed with RIG edge selectivities — exponential, so only feasible
  *     for small patterns (the paper's point in Table 4).
  */
object SearchOrder {

  sealed trait Strategy { def name: String }
  case object JO extends Strategy { val name = "JO" }
  case object RI extends Strategy { val name = "RI" }
  case object BJ extends Strategy { val name = "BJ" }

  def compute(strategy: Strategy, rig: RIG): Array[Int] = strategy match {
    case JO => jo(rig)
    case RI => ri(rig.pattern)
    case BJ => bj(rig)
  }

  /** Greedy join ordering on cos cardinalities [26 adapted to RIG stats]. */
  def jo(rig: RIG): Array[Int] = {
    val p = rig.pattern
    val n = p.numNodes
    val chosen = Array.fill(n)(false)
    val order = new Array[Int](n)
    order(0) = (0 until n).minBy(q => (rig.cos(q).length, q))
    chosen(order(0)) = true
    for (i <- 1 until n) {
      val cands = (0 until n).filter(q =>
        !chosen(q) && p.neighbors(q).exists(chosen))
      val next = cands.minBy(q => (rig.cos(q).length, q))
      order(i) = next; chosen(next) = true
    }
    order
  }

  /** RI ordering [9]: order by the number of edge constraints against the
    * prefix, then by (undirected) degree, independent of the data graph.
    */
  def ri(p: Pattern): Array[Int] = {
    val n = p.numNodes
    def degree(q: Int): Int = p.neighbors(q).length
    val chosen = Array.fill(n)(false)
    val order = new Array[Int](n)
    order(0) = (0 until n).maxBy(q => (degree(q), -q))
    chosen(order(0)) = true
    for (i <- 1 until n) {
      val cands = (0 until n).filter(q => !chosen(q) && p.neighbors(q).exists(chosen))
      val next = cands.maxBy { q =>
        val intoPrefix = p.neighbors(q).count(chosen)
        (intoPrefix, degree(q), -q)
      }
      order(i) = next; chosen(next) = true
    }
    order
  }

  /** Exact left-deep DP: minimize the sum of estimated intermediate result
    * cardinalities under independence, with selectivity of a query edge e
    * estimated as |cos(e)| / (|cos(from)| * |cos(to)|). Only connected
    * extensions are considered. Patterns beyond 14 nodes fall back to JO —
    * the DP is O(2^n · n), which is exactly why the paper finds BJ unusable
    * for large queries.
    */
  def bj(rig: RIG): Array[Int] = {
    val p = rig.pattern
    val n = p.numNodes
    if (n > 14) return jo(rig)
    val card = rig.cos.map(c => math.max(1.0, c.length.toDouble))
    val sel = p.edges.indices.map { ei =>
      val e = p.edges(ei)
      val edges = rig.fwdAdj(ei).map(_.length.toLong).sum.toDouble
      math.min(1.0, math.max(1e-12, edges / (card(e.from) * card(e.to))))
    }
    // Estimated cardinality of the subquery induced by a node subset.
    def estimate(mask: Int): Double = {
      var est = 1.0
      var q = 0
      while (q < n) { if ((mask & (1 << q)) != 0) est *= card(q); q += 1 }
      p.edges.indices.foreach { ei =>
        val e = p.edges(ei)
        if ((mask & (1 << e.from)) != 0 && (mask & (1 << e.to)) != 0) est *= sel(ei)
      }
      est
    }
    val full = (1 << n) - 1
    val best = new java.util.HashMap[Integer, (Double, List[Int])]()
    (0 until n).foreach(q => best.put(1 << q, (0.0, List(q))))
    // Grow left-deep plans by popcount layers.
    for (size <- 1 until n) {
      val masks = best.keySet().toArray.map(_.asInstanceOf[Integer].intValue)
        .filter(Integer.bitCount(_) == size)
      masks.foreach { mask =>
        val (cost, orderRev) = best.get(mask)
        (0 until n).foreach { q =>
          if ((mask & (1 << q)) == 0 && p.neighbors(q).exists(x => (mask & (1 << x)) != 0)) {
            val nm = mask | (1 << q)
            val newCost = cost + estimate(nm)
            val cur = best.get(nm)
            if (cur == null || newCost < cur._1) best.put(nm, (newCost, q :: orderRev))
          }
        }
      }
    }
    best.get(full)._2.reverse.toArray
  }
}
