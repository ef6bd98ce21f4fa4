package repro.pattern

/** Renders a pattern query as SQL over `nodes(id, label)`, `edges(src, dst)`
  * and a materialized `reach(src, dst)` table — the DuckDB side of the
  * correctness oracle. Homomorphic semantics fall out of plain joins (no
  * injectivity constraint); every output column is aliased `q<i>` to match
  * the Spark answer DataFrames.
  */
object PatternSQL {

  def sql(p: Pattern): String = {
    val selects = (0 until p.numNodes).map(q => s"n$q.id AS ${p.colName(q)}")
    val nodeTables = (0 until p.numNodes).map(q => s"nodes n$q")
    val edgeTables = p.edges.zipWithIndex.map {
      case (PEdge(_, _, Direct), i) => s"edges e$i"
      case (PEdge(_, _, Reach), i) => s"reach e$i"
    }
    val labelPreds = (0 until p.numNodes).map(q => s"n$q.label = '${p.labels(q)}'")
    val edgePreds = p.edges.zipWithIndex.flatMap { case (e, i) =>
      Seq(s"e$i.src = n${e.from}.id", s"e$i.dst = n${e.to}.id")
    }
    s"""SELECT ${selects.mkString(", ")}
       |FROM ${(nodeTables ++ edgeTables).mkString(", ")}
       |WHERE ${(labelPreds ++ edgePreds).mkString(" AND ")}""".stripMargin
  }
}
