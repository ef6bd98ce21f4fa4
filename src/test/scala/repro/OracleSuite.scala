package repro

import repro.graph.{GraphDF, GraphGen}
import repro.pattern.{Direct, PatternSQL, PEdge, Pattern, Reach, Templates}

class PatternSQLSuite extends SparkSpec with SeededChecks {

  test("generated SQL references the right tables per edge kind") {
    val p = Pattern("X", Vector("a", "b", "c"),
      Vector(PEdge(0, 1, Direct), PEdge(1, 2, Reach)))
    val sql = PatternSQL.sql(p)
    assert(sql.contains("edges e0"))
    assert(sql.contains("reach e1"))
    assert(sql.contains("n0.id AS q0") && sql.contains("n2.id AS q2"))
    assert(sql.contains("n1.label = 'b'"))
  }

  test("DuckDB evaluation of the generated SQL equals brute force") {
    forSeeds(6) { seed =>
      val g = GraphGen.random(20, 50, 3, seed)
      val p = Templates.randomPattern(g, n = 3, extraEdges = 1, reachProb = 0.5, seed, "Q")
      import spark.implicits._
      val nodes = GraphDF.nodesDF(spark, g)
      val edges = GraphDF.edgesDF(spark, g)
      val reach = repro.graph.reach.TransitiveClosure.pairs(g).toSeq
        .map { case (u, v) => (u.toLong, v.toLong) }.toDF("src", "dst")
      val exp = BruteForce.answer(g, p).toSeq
        .map(t => t.map(_.toLong))
      val expDF = spark.createDataFrame(
        spark.sparkContext.parallelize(exp.map(org.apache.spark.sql.Row.fromSeq)),
        org.apache.spark.sql.types.StructType((0 until p.numNodes).map(q =>
          org.apache.spark.sql.types.StructField(p.colName(q),
            org.apache.spark.sql.types.LongType, nullable = false))))
      Oracle.assertEquivalent(expDF, PatternSQL.sql(p),
        "nodes" -> nodes, "edges" -> edges, "reach" -> reach)
    }
  }

  test("oracle catches a wrong answer") {
    val g = GraphGen.random(20, 50, 3, seed = 1)
    val p = Templates.randomPattern(g, n = 3, extraEdges = 0, reachProb = 0.0, 1, "Q")
    import spark.implicits._
    val nodes = GraphDF.nodesDF(spark, g)
    val edges = GraphDF.edgesDF(spark, g)
    val reach = Seq.empty[(Long, Long)].toDF("src", "dst")
    val wrong = spark.createDataFrame(
      spark.sparkContext.parallelize(Seq(org.apache.spark.sql.Row((0 until p.numNodes).map(_ => 999L): _*))),
      org.apache.spark.sql.types.StructType((0 until p.numNodes).map(q =>
        org.apache.spark.sql.types.StructField(p.colName(q),
          org.apache.spark.sql.types.LongType, nullable = false))))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, PatternSQL.sql(p),
        "nodes" -> nodes, "edges" -> edges, "reach" -> reach)
    }
  }
}
