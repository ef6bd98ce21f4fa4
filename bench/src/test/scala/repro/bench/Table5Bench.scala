package repro.bench

import repro.SparkSpec
import repro.util.Timing

/** Regenerates Table 5 (EH / Neo4j-analogue / GM on C-queries, em and ep). */
class Table5Bench extends SparkSpec {

  test("Table 5: GM solves every C-query and beats the engines overall") {
    val (rows, rendered) = Table5Harness.run(spark)
    println(rendered)
    assert(rows.size == 24)

    // Paper shape 1: GM solves all queries on both datasets.
    rows.foreach(r => assert(r.gm.isInstanceOf[Timing.Solved], s"${r.dataset}/${r.query} GM"))

    // Paper shape 2: EH total includes its precompute, so wherever both
    // solved, EH total >= EH probe.
    rows.foreach { r =>
      (r.eh, Option(r.ehProbe)) match {
        case (s: Timing.Solved, Some(p: Timing.Solved)) =>
          assert(s.seconds >= p.seconds - 0.25, s"${r.dataset}/${r.query}")
        case _ => ()
      }
    }

    // Paper shape 3: summed over the workload (failures counted at their
    // elapsed budget), GM is the fastest of the four systems.
    val gmTotal = rows.map(_.gm.seconds).sum
    val ehTotal = rows.map(_.eh.seconds).sum
    val neoTotal = rows.map(_.neo.seconds).sum
    println(f"[Table5Bench] totals: GM=$gmTotal%.2f EH=$ehTotal%.2f Neo=$neoTotal%.2f")
    assert(gmTotal < ehTotal, "GM should beat EH incl. precompute overall")
    assert(gmTotal < neoTotal, "GM should beat the binary-join engine overall")

    // Answers agree wherever GM and the Neo4j analogue both finished
    // (both capped at the same match limit).
    rows.foreach { r =>
      (r.gm, r.neo) match {
        case (Timing.Solved(_, a), Timing.Solved(_, b)) =>
          assert(a == math.min(b, BenchEnv.limit) || a == b,
            s"${r.dataset}/${r.query}: GM=$a Neo=$b")
        case _ => ()
      }
    }
  }
}
