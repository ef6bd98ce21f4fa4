package repro.pattern

import org.scalatest.funsuite.AnyFunSuite
import repro.SeededChecks
import repro.graph.GraphGen

class PatternSuite extends AnyFunSuite {

  private val diamond = Pattern("D", Vector("a", "b", "b", "c"),
    Vector(PEdge(0, 1, Direct), PEdge(0, 2, Reach), PEdge(1, 3, Direct), PEdge(2, 3, Reach)))

  test("basic accessors") {
    assert(diamond.numNodes == 4 && diamond.numEdges == 4)
    assert(diamond.outEdges(0).map(_.to) == Vector(1, 2))
    assert(diamond.inEdges(3).map(_.from) == Vector(1, 2))
    assert(diamond.colName(2) == "q2")
  }

  test("validation rejects malformed patterns") {
    intercept[IllegalArgumentException](
      Pattern("bad", Vector("a"), Vector(PEdge(0, 0, Direct))))
    intercept[IllegalArgumentException](
      Pattern("bad", Vector("a", "b"), Vector(PEdge(0, 5, Direct))))
    intercept[IllegalArgumentException](
      Pattern("bad", Vector("a", "b"), Vector(PEdge(0, 1, Direct), PEdge(0, 1, Direct))))
  }

  test("neighbors are undirected and deduplicated") {
    assert(diamond.neighbors(0).toSet == Set(1, 2))
    assert(diamond.neighbors(3).toSet == Set(1, 2))
  }

  test("connectivity") {
    assert(diamond.isConnected)
    val disc = Pattern("disc", Vector("a", "b", "c"), Vector(PEdge(0, 1, Direct)))
    assert(!disc.isConnected)
  }

  test("topological order on a dag") {
    val order = diamond.topologicalOrder.get
    assert(order.indexOf(0) < order.indexOf(1))
    assert(order.indexOf(1) < order.indexOf(3))
    assert(diamond.isDag)
  }

  test("cyclic pattern has no topological order and decomposes into dag + Δ") {
    val cyc = Pattern("C", Vector("a", "b", "c"),
      Vector(PEdge(0, 1, Direct), PEdge(1, 2, Direct), PEdge(2, 0, Reach)))
    assert(!cyc.isDag)
    val (dag, back) = cyc.dagDecomposition
    assert(dag.isDag)
    assert(back.nonEmpty)
    assert((dag.edges ++ back).toSet == cyc.edges.toSet)
  }

  test("pattern classes per the paper taxonomy") {
    assert(Templates.template(0).patternClass == "acyclic")
    assert(Templates.template(2).patternClass == "acyclic")
    assert(Templates.template(6).patternClass == "cyclic")
    assert(Templates.template(9).patternClass == "cyclic")
    assert(Templates.template(11).patternClass == "clique")
    assert(Templates.template(19).patternClass == "clique")
    assert(Templates.template(10).patternClass == "combo")
    assert(Templates.template(16).patternClass == "combo")
  }

  test("C/D variants flip edge kinds and rename") {
    val h = diamond.copy(name = "HQx")
    val c = h.toCQuery
    val d = h.toDQuery
    assert(c.name == "CQx" && c.edges.forall(_.kind == Direct))
    assert(d.name == "DQx" && d.edges.forall(_.kind == Reach))
    assert(c.labels == h.labels)
  }
}

class TemplatesSuite extends AnyFunSuite with SeededChecks {

  test("all twenty templates exist, are connected, and are hybrid") {
    assert(Templates.all.size == 20)
    Templates.all.foreach { p =>
      assert(p.isConnected, p.name)
      assert(p.edges.exists(_.kind == Direct) && p.edges.exists(_.kind == Reach),
        s"${p.name} should be hybrid")
    }
  }

  test("class constraints from the paper hold") {
    // Acyc {0..5}, Cyc {6,7,8,9,15,17}, Clique {11,12,18,19}, Combo {10,13,14,16}
    val classes = Templates.all.map(p => p.name -> p.patternClass).toMap
    Seq(0, 1, 2, 3, 4, 5).foreach(i => assert(classes(s"HQ$i") == "acyclic", s"HQ$i"))
    Seq(6, 7, 8, 9, 15, 17).foreach(i => assert(classes(s"HQ$i") == "cyclic", s"HQ$i"))
    Seq(11, 12, 18, 19).foreach(i => assert(classes(s"HQ$i") == "clique", s"HQ$i"))
    Seq(10, 13, 14, 16).foreach(i => assert(classes(s"HQ$i") == "combo", s"HQ$i"))
  }

  test("HQ2 is a tree and HQ19 is a 7-clique (paper constraints)") {
    val hq2 = Templates.template(2)
    assert(hq2.isUndirectedAcyclic)
    val hq19 = Templates.template(19)
    assert(hq19.numNodes == 7 && hq19.numEdges == 21)
  }

  test("instantiation assigns real labels deterministically") {
    val g = GraphGen.random(60, 150, 5, seed = 3)
    val p1 = Templates.hQuery(4, g)
    val p2 = Templates.hQuery(4, g)
    assert(p1 == p2)
    assert(p1.labels.forall(l => g.labelId(l).isDefined))
  }

  test("frequentLabels is sorted by frequency descending") {
    val g = GraphGen.random(100, 200, 4, seed = 5)
    val freq = Templates.frequentLabels(g)
    val counts = freq.map(l => g.invertedListByName(l).length)
    assert(counts.toSeq == counts.toSeq.sortBy(-(_: Int)))
  }

  test("random patterns are connected with requested size and kinds") {
    val g = GraphGen.random(80, 200, 4, seed = 6)
    forSeeds(20) { seed =>
      val p = Templates.randomPattern(g, n = 7, extraEdges = 2, reachProb = 1.0, seed, "T")
      assert(p.numNodes == 7)
      assert(p.isConnected)
      assert(p.edges.forall(_.kind == Reach))
      assert(p.numEdges >= 6)
    }
  }

  test("biology D-query workload: ten queries, ascending sizes, all reach") {
    val g = GraphGen.random(80, 200, 4, seed = 6)
    val qs = Templates.biologyDQueries(g, maxNodes = 20, seed = 1)
    assert(qs.size == 10)
    assert(qs.map(_.numNodes) == qs.map(_.numNodes).sorted)
    assert(qs.head.numNodes == 4 && qs.last.numNodes <= 20)
    qs.foreach(p => assert(p.edges.forall(_.kind == Reach)))
  }
}
