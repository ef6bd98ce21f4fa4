package repro.pattern

import scala.util.Random
import repro.graph.Graph

/** The 20 query templates of the paper's Fig. 7 and the random-query
  * workloads of §7.1.
  *
  * Fig. 7's exact drawings are not machine-readable from the text, so the
  * structures below are reconstructed to satisfy every textual constraint:
  * classes Acyc {0..5}, Cyc {6,7,8,9,15,17}, Clique {11,12,18,19},
  * Combo {10,13,14,16}; HQ2 is a tree; HQ19 is a 7-clique; combos have more
  * than two undirected cycles ("acyclic" in the paper means the *undirected*
  * pattern is a tree). H-instances mark alternating edges as reachability
  * edges (the paper flips edges "with 50% probability"); C turns all edges
  * direct, D all reachability.
  *
  * Label instantiation is deterministic per (template, graph): node q takes
  * the `(3q + seed) mod K`-th most frequent label of the target graph, with K
  * capped so match sets stay non-trivial.
  */
object Templates {

  private def t(id: Int, n: Int, es: (Int, Int)*): Pattern = {
    val edges = es.toVector.zipWithIndex.map { case ((f, to), i) =>
      PEdge(f, to, if (i % 2 == 0) Reach else Direct)
    }
    Pattern(s"HQ$id", Vector.fill(n)("?"), edges)
  }

  /** Structural templates HQ0..HQ19 with placeholder labels. */
  val all: Vector[Pattern] = Vector(
    // --- acyclic (undirected trees) ---
    t(0, 4, (0, 1), (1, 2), (2, 3)),
    t(1, 5, (0, 1), (0, 2), (2, 3), (2, 4)),
    t(2, 6, (0, 1), (1, 2), (1, 3), (0, 4), (4, 5)),
    t(3, 7, (0, 1), (0, 2), (1, 3), (1, 4), (2, 5), (5, 6)),
    t(4, 6, (0, 1), (1, 2), (2, 3), (1, 4), (0, 5)),
    t(5, 5, (0, 1), (0, 2), (0, 3), (3, 4)),
    // --- cyclic (1-2 undirected cycles) ---
    t(6, 4, (0, 1), (0, 2), (1, 3), (2, 3)),
    t(7, 5, (0, 1), (0, 2), (1, 3), (2, 3), (3, 4)),
    t(8, 6, (0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (2, 4), (4, 5)),
    t(9, 4, (0, 1), (1, 2), (2, 3), (3, 0)),
    // --- combo (>2 undirected cycles) ---
    t(10, 5, (0, 1), (0, 2), (1, 2), (1, 3), (2, 3), (2, 4), (3, 4), (0, 4)),
    // --- clique ---
    clique(11, 4),
    clique(12, 5),
    // --- combo ---
    t(13, 6, (0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (0, 5), (1, 4), (2, 4), (0, 2)),
    t(14, 6, (0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (0, 5), (0, 2), (1, 3), (2, 5), (3, 5)),
    // --- cyclic ---
    t(15, 5, (0, 1), (1, 2), (2, 0), (2, 3), (3, 4)),
    // --- combo ---
    t(16, 7, (0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 6), (0, 6), (1, 5), (2, 5), (3, 5)),
    // --- cyclic ---
    t(17, 5, (0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (2, 4)),
    // --- clique ---
    clique(18, 6),
    clique(19, 7),
  )

  private def clique(id: Int, n: Int): Pattern = {
    val pairs = for (i <- 0 until n; j <- i + 1 until n) yield (i, j)
    t(id, n, pairs: _*)
  }

  def template(id: Int): Pattern = all(id)

  /** Labels of `g` ordered by descending frequency. */
  def frequentLabels(g: Graph): Array[String] = {
    val counts = new Array[Int](g.numLabels)
    g.labels.foreach(counts(_) += 1)
    counts.zipWithIndex.sortBy(-_._1).map { case (_, l) => g.labelNames(l) }
  }

  /** Instantiates a template's labels against a data graph. */
  def instantiate(p: Pattern, g: Graph, seed: Int = 0): Pattern = {
    val freq = frequentLabels(g)
    val k = math.min(freq.length, math.max(3, p.numNodes))
    p.copy(labels = Vector.tabulate(p.numNodes)(q => freq((3 * q + seed) % k)))
  }

  /** H-query instance `HQ<id>` on `g`. */
  def hQuery(id: Int, g: Graph, seed: Int = 0): Pattern = instantiate(template(id), g, seed)

  /** C-query instance (all direct edges). */
  def cQuery(id: Int, g: Graph, seed: Int = 0): Pattern = hQuery(id, g, seed).toCQuery

  /** D-query instance (all reachability edges). */
  def dQuery(id: Int, g: Graph, seed: Int = 0): Pattern = hQuery(id, g, seed).toDQuery

  /** Random connected pattern with `n` nodes (the biology workloads, §7.1):
    * a random spanning tree plus `extraEdges` chords, labels drawn from the
    * graph's frequent labels. `reachProb` controls the H/C/D mix.
    */
  def randomPattern(g: Graph, n: Int, extraEdges: Int, reachProb: Double,
                    seed: Long, name: String): Pattern = {
    val rnd = new Random(seed)
    val edges = scala.collection.mutable.LinkedHashSet.empty[(Int, Int)]
    for (q <- 1 until n) {
      val p = rnd.nextInt(q)
      if (rnd.nextBoolean()) edges += ((p, q)) else edges += ((q, p))
    }
    var tries = 0
    while (edges.size < n - 1 + extraEdges && tries < 20 * extraEdges + 40) {
      val a = rnd.nextInt(n); val b = rnd.nextInt(n)
      if (a != b && !edges.contains((a, b)) && !edges.contains((b, a))) edges += ((a, b))
      tries += 1
    }
    val freq = frequentLabels(g)
    val k = math.min(freq.length, math.max(3, n))
    val labels = Vector.fill(n)(freq(rnd.nextInt(k)))
    val pes = edges.toVector.map { case (f, to) =>
      PEdge(f, to, if (rnd.nextDouble() < reachProb) Reach else Direct)
    }
    Pattern(name, labels, pes)
  }

  /** The ten ascending-size random D-queries per biology graph (Table 3). */
  def biologyDQueries(g: Graph, maxNodes: Int, seed: Long): Vector[Pattern] = {
    val sizes = (0 until 10).map(i => 4 + i * math.max(1, (maxNodes - 4) / 9)).map(math.min(_, maxNodes))
    sizes.zipWithIndex.map { case (n, i) =>
      randomPattern(g, n, extraEdges = math.max(1, n / 4), reachProb = 1.0,
        seed = seed * 31 + i, name = s"DR$i-${n}N")
    }.toVector
  }
}
