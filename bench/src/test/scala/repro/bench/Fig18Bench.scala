package repro.bench

import repro.SparkSpec
import repro.util.Timing

/** Regenerates the tabular parts of Fig. 18 (bonus: index-build cost and
  * D-query comparison with engines needing a transitive closure).
  */
class Fig18Bench extends SparkSpec {

  test("Fig 18a: BFL builds orders of magnitude faster than the closure") {
    val (rows, rendered) = Fig18Harness.runBuild(spark)
    println(rendered)
    assert(rows.size == 6)
    rows.foreach { r =>
      // BFL is near-instant at these sizes.
      assert(r.bflSec < 2.0, s"BFL should be cheap (${r.bflSec}s)")
      // TC build (when it finishes) dwarfs BFL build.
      r.tc match {
        case Timing.Solved(sec, _) => assert(sec > r.bflSec, s"TC $sec vs BFL ${r.bflSec}")
        case _ => () // timing out only strengthens the paper's point
      }
    }
    // TC cost grows with the node count (or times out at the top end).
    val tc1k = rows.find(r => r.nodes == 1000 && r.labels == 20).get.tc.seconds
    val tc3k = rows.find(r => r.nodes == 3000 && r.labels == 20).get.tc.seconds
    assert(tc3k >= tc1k * 0.8, s"TC should not get cheaper with size: $tc1k vs $tc3k")
  }

  test("Fig 18b: GM evaluates D-queries without materializing any closure") {
    val (rows, rendered) = Fig18Harness.runQueries(spark)
    println(rendered)
    assert(rows.size == 12)
    rows.foreach(r => assert(r.gm.isInstanceOf[Timing.Solved], s"${r.query}/${r.labels} GM"))
    // Paper shape: the binary-join engine (no reachability index) is the
    // worst performer overall.
    val gmTotal = rows.map(_.gm.seconds).sum
    val neoTotal = rows.map(_.neo.seconds).sum
    println(f"[Fig18Bench] totals: GM=$gmTotal%.2f Neo=$neoTotal%.2f")
    assert(gmTotal < neoTotal)
  }
}
