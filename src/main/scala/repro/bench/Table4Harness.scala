package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.SearchOrder
import repro.pattern.Templates
import repro.util.{TableFmt, Timing}

/** Table 4 — effectiveness of the search ordering methods RI, JO and BJ for
  * H-queries HQ2, HQ3, HQ4, HQ15, HQ18 on em and ep (GM-RI / GM-JO / GM-BJ).
  */
object Table4Harness {

  final case class Row(dataset: String, query: String,
                       ri: Timing.Outcome, jo: Timing.Outcome, bj: Timing.Outcome)

  /** Paper Table 4 (seconds): query -> (em RI, em JO, em BJ, ep RI, ep JO, ep BJ). */
  val paper: Map[String, (Double, Double, Double, Double, Double, Double)] = Map(
    "HQ2" -> (3.64, 1.88, 2.45, 7.00, 2.02, 2.09),
    "HQ3" -> (76.94, 53.75, 53.75, 90.92, 40.15, 41.71),
    "HQ4" -> (3.06, 1.05, 1.05, 4.67, 0.67, 0.88),
    "HQ15" -> (1.33, 7.32, 1.79, 14.77, 2.22, 3.01),
    "HQ18" -> (7.07, 0.99, 1.36, 441.94, 30.18, 38.15),
  )

  val queryIds = Seq(2, 3, 4, 15, 18)

  def run(spark: SparkSession): (Seq[Row], String) = {
    BenchEnv.quiet(spark)
    val rows = for {
      ds <- Seq("em", "ep")
      id <- queryIds
    } yield {
      val ops = BenchEnv.ops(ds)
      val q = Templates.hQuery(id, ops.g)
      Row(ds, q.name,
        QueryRunners.gm(spark, ops, q, SearchOrder.RI),
        QueryRunners.gm(spark, ops, q, SearchOrder.JO),
        QueryRunners.gm(spark, ops, q, SearchOrder.BJ))
    }
    (rows, render(rows))
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      s"Table 4: search ordering strategies on em/ep (seconds; paper values in parens)",
      Seq("Dataset", "Query", "GM-RI (paper)", "GM-JO (paper)", "GM-BJ (paper)"),
      rows.map { r =>
        val p = paper(r.query)
        val (pri, pjo, pbj) = if (r.dataset == "em") (p._1, p._2, p._3) else (p._4, p._5, p._6)
        Seq(r.dataset, r.query,
          s"${r.ri.shortLabel} ($pri)", s"${r.jo.shortLabel} ($pjo)", s"${r.bj.shortLabel} ($pbj)")
      })
}
