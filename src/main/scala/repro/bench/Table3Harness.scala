package repro.bench

import org.apache.spark.sql.SparkSession
import repro.pattern.Templates
import repro.util.{TableFmt, Timing}

/** Table 3 — JM vs TM vs GM on ten large random D-queries over the biology
  * graphs hu, hp, yt: failure counts (timeout / out-of-memory), solved count
  * and average solved runtime.
  */
object Table3Harness {

  final case class Row(dataset: String, alg: String, timeOut: Int, oom: Int,
                       solvedCount: Int, avgSolvedSec: Double)

  /** Paper's Table 3 for side-by-side display. */
  val paper: Seq[(String, String, Int, Int, Int, Double)] = Seq(
    ("hu", "JM", 1, 7, 2, 1.51), ("hu", "TM", 3, 0, 7, 16.7), ("hu", "GM", 0, 0, 10, 0.53),
    ("hp", "JM", 2, 4, 4, 1.86), ("hp", "TM", 1, 0, 9, 134.21), ("hp", "GM", 0, 0, 10, 0.58),
    ("yt", "JM", 5, 3, 2, 0.14), ("yt", "TM", 3, 0, 7, 20.8), ("yt", "GM", 0, 0, 10, 0.34),
  )

  private val maxNodes = Map("hu" -> 20, "hp" -> 32, "yt" -> 32)

  def run(spark: SparkSession): (Seq[Row], String) = {
    BenchEnv.quiet(spark)
    val rows = Seq("hu", "hp", "yt").flatMap { ds =>
      val ops = BenchEnv.ops(ds)
      val bfl = BenchEnv.bfl(ds)
      val queries = Templates.biologyDQueries(ops.g, maxNodes(ds), seed = 42)
      def summarize(alg: String, outs: Seq[Timing.Outcome]): Row = {
        val to = outs.count(o => o.isInstanceOf[Timing.TimedOut] || o.isInstanceOf[Timing.Failed])
        val om = outs.count(_.isInstanceOf[Timing.OutOfMemory])
        val ok = QueryRunners.solved(outs)
        Row(ds, alg, to, om, ok.size,
          if (ok.nonEmpty) ok.map(_.seconds).sum / ok.size else Double.NaN)
      }
      val jmOuts = queries.map(q => QueryRunners.jm(spark, ops, q))
      val tmOuts = queries.map(q => QueryRunners.tm(spark, ops, bfl, q))
      val gmOuts = queries.map(q => QueryRunners.gm(spark, ops, q))
      Seq(summarize("JM", jmOuts), summarize("TM", tmOuts), summarize("GM", gmOuts))
    }
    (rows, render(rows))
  }

  def render(rows: Seq[Row]): String = {
    val paperIx = paper.map(p => (p._1, p._2) -> p).toMap
    TableFmt.render(
      s"Table 3: large D-queries on hu/hp/yt (timeout=${BenchEnv.timeoutSec}s, " +
        s"OOM budget=${BenchEnv.budgetRows} rows, limit=${BenchEnv.limit})",
      Seq("Dataset", "Alg", "TO (paper)", "OM (paper)", "Solved (paper)", "AvgSec (paper)"),
      rows.map { r =>
        val p = paperIx((r.dataset, r.alg))
        Seq(r.dataset, r.alg,
          s"${r.timeOut} (${p._3})", s"${r.oom} (${p._4})",
          s"${r.solvedCount} (${p._5})",
          (if (r.avgSolvedSec.isNaN) "-" else TableFmt.fmtSec(r.avgSolvedSec)) + s" (${p._6})")
      })
  }
}
