package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Regenerates Table 2 (dataset statistics). */
class Table2Bench extends AnyFunSuite {

  test("Table 2: dataset statistics match the scaled paper shapes") {
    val (rows, rendered) = Table2Harness.run()
    println(rendered)
    assert(rows.size == 9)
    rows.foreach { r =>
      val spec = repro.graph.GraphGen.specs(BenchEnv.scaleFor(r.name))(r.name)
      assert(r.v == spec.numNodes, s"${r.name} |V|")
      // Dedup during generation may drop a small fraction of edges.
      assert(r.e >= spec.numEdges * 0.85 && r.e <= spec.numEdges, s"${r.name} |E|")
      assert(r.l == spec.numLabels, s"${r.name} |L|")
      assert(math.abs(r.dAvg - 2.0 * r.e / r.v) < 1e-9)
    }
    // Relative shapes of the paper hold: hu is the densest biology graph,
    // em is the sparsest dataset overall.
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("hu").dAvg > byName("yt").dAvg && byName("hu").dAvg > byName("hp").dAvg)
    assert(byName("em").dAvg == rows.map(_.dAvg).min)
  }
}
