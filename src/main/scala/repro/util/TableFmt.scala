package repro.util

/** ASCII table rendering for bench output: every bench prints the paper's
  * numbers next to the measured ones so a reader can diff shapes directly.
  */
object TableFmt {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.length) r(i).length else 0).max)
    def line(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtSec(s: Double): String = f"$s%.2f"
}
