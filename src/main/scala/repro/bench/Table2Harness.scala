package repro.bench

import repro.util.TableFmt

/** Table 2 — key statistics of the (synthetic stand-ins for the) datasets. */
object Table2Harness {

  final case class Row(name: String, v: Long, e: Long, l: Int, dAvg: Double)

  /** Paper's Table 2 values for side-by-side display. */
  val paper: Map[String, (String, String, Int, Double)] = Map(
    "yt" -> ("3.1K", "12K", 71, 8.05),
    "hu" -> ("4.6K", "86K", 44, 36.9),
    "hp" -> ("9.4K", "35K", 307, 7.4),
    "ep" -> ("76K", "509K", 20, 6.87),
    "db" -> ("317K", "1049K", 20, 6.62),
    "em" -> ("265K", "420K", 20, 2.6),
    "am" -> ("403K", "3.5M", 3, 6.29),
    "bs" -> ("685K", "7.6M", 5, 11.76),
    "go" -> ("876K", "5.1M", 5, 6.47),
  )

  val order = Seq("yt", "hu", "hp", "ep", "db", "em", "am", "bs", "go")

  def measure(): Seq[Row] = order.map { name =>
    val g = BenchEnv.graph(name)
    Row(name, g.numNodes, g.numEdges, g.numLabels, g.avgDegree)
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "Table 2: dataset statistics (paper vs measured; medium/large graphs scaled by " +
        s"REPRO_SCALE=${BenchEnv.scale})",
      Seq("Dataset", "paper |V|", "|V|", "paper |E|", "|E|", "paper |L|", "|L|",
        "paper d_avg", "d_avg"),
      rows.map { r =>
        val p = paper(r.name)
        Seq(r.name, p._1, r.v.toString, p._2, r.e.toString, p._3.toString,
          r.l.toString, p._4.toString, f"${r.dAvg}%.2f")
      })

  def run(): (Seq[Row], String) = {
    val rows = measure()
    (rows, render(rows))
  }
}
