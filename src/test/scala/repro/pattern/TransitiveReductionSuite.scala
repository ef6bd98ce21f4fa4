package repro.pattern

import org.scalatest.funsuite.AnyFunSuite
import repro.{BruteForce, SeededChecks}
import repro.graph.GraphGen

class TransitiveReductionSuite extends AnyFunSuite with SeededChecks {

  test("closure pairs apply IR1 and IR2 (paper §3 example)") {
    // A -> B -> C plus reachability (A, C): the edge (A, C) is transitive.
    val q = Pattern("Q", Vector("a", "b", "c"),
      Vector(PEdge(0, 1, Direct), PEdge(1, 2, Direct), PEdge(0, 2, Reach)))
    val closure = TransitiveReduction.closurePairs(q)
    assert(closure == Set((0, 1), (1, 2), (0, 2)))
  }

  test("the paper's example reduction: (A,C) removed") {
    val q = Pattern("Q", Vector("a", "b", "c"),
      Vector(PEdge(0, 1, Direct), PEdge(1, 2, Direct), PEdge(0, 2, Reach)))
    val r = TransitiveReduction.reduce(q)
    assert(r.edges.toSet == Set(PEdge(0, 1, Direct), PEdge(1, 2, Direct)))
  }

  test("direct edges are never removed") {
    val q = Pattern("Q", Vector("a", "b", "c"),
      Vector(PEdge(0, 1, Direct), PEdge(1, 2, Direct), PEdge(0, 2, Direct)))
    assert(TransitiveReduction.reduce(q) == q)
  }

  test("reachability edge kept when it is the only path") {
    val q = Pattern("Q", Vector("a", "b"), Vector(PEdge(0, 1, Reach)))
    assert(TransitiveReduction.reduce(q) == q)
  }

  test("chains of reachability edges collapse transitively") {
    val q = Pattern("Q", Vector("a", "b", "c", "d"),
      Vector(PEdge(0, 1, Reach), PEdge(1, 2, Reach), PEdge(2, 3, Reach),
        PEdge(0, 2, Reach), PEdge(0, 3, Reach), PEdge(1, 3, Reach)))
    val r = TransitiveReduction.reduce(q)
    assert(r.edges.toSet ==
      Set(PEdge(0, 1, Reach), PEdge(1, 2, Reach), PEdge(2, 3, Reach)))
  }

  test("reduction preserves the query answer on random graphs/patterns") {
    val g = GraphGen.random(30, 70, 3, seed = 4)
    forSeeds(30) { seed =>
      val base = Templates.randomPattern(g, n = 4, extraEdges = 2, reachProb = 0.6, seed, "R")
      val reduced = TransitiveReduction.reduce(base)
      assert(reduced.numEdges <= base.numEdges)
      assert(BruteForce.answer(g, reduced) == BruteForce.answer(g, base),
        s"${base.edges} vs ${reduced.edges}")
    }
  }

  test("reduction of D-query templates preserves answers (paper §7.4)") {
    val g = GraphGen.random(40, 100, 4, seed = 11)
    Seq(0, 6, 10).foreach { id =>
      val d = Templates.dQuery(id, g)
      val r = TransitiveReduction.reduce(d)
      assert(BruteForce.answer(g, r) == BruteForce.answer(g, d), s"DQ$id")
    }
  }

  test("reduction is idempotent") {
    forSeeds(20) { seed =>
      val g = GraphGen.random(20, 40, 3, seed)
      val p = Templates.randomPattern(g, n = 5, extraEdges = 3, reachProb = 0.8, seed, "I")
      val once = TransitiveReduction.reduce(p)
      assert(TransitiveReduction.reduce(once) == once)
    }
  }
}
