package repro.baselines

import org.apache.spark.sql.types.{LongType, StructField, StructType}
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.roaringbitmap.RoaringBitmap
import repro.graph.reach.ReachOps
import repro.pattern.{Direct, Pattern, Reach}

/** Match relations for individual query edges — the input units of the
  * join-based approach (JM) and of binary-join engines.
  *
  * For a query edge e = (p, q), the relation holds all pairs (u, v) from the
  * given candidate sets with (u, v) ∈ E for direct edges, or u ≺ v for
  * reachability edges (paper §4.1, ms(e)). Pair production is distributed:
  * sources are partitioned, the CSR/condensation ships via broadcast.
  */
object EdgeMatches {

  /** DataFrame of edge matches with columns (colName(from), colName(to)). */
  def matchDF(spark: SparkSession, ops: ReachOps, p: Pattern, edgeIdx: Int,
              cand: Array[RoaringBitmap]): DataFrame = {
    val e = p.edges(edgeIdx)
    val sources = cand(e.from).toArray
    val targets = cand(e.to).toArray
    val schema = StructType(Seq(
      StructField(p.colName(e.from), LongType, nullable = false),
      StructField(p.colName(e.to), LongType, nullable = false)))
    val sc = spark.sparkContext
    if (sources.isEmpty || targets.isEmpty)
      return spark.createDataFrame(sc.emptyRDD[Row], schema)
    val bOps = sc.broadcast(ops)
    val bTargets = sc.broadcast(targets)
    val kind = e.kind
    val parts = math.max(1, math.min(sc.defaultParallelism * 2, sources.length / 64 + 1))
    val rows = sc.parallelize(sources.toIndexedSeq, parts).mapPartitions { it =>
      val o = bOps.value
      kind match {
        case Direct =>
          val targetSet = RoaringBitmap.bitmapOf(bTargets.value: _*)
          it.flatMap { u =>
            val g = o.g
            val out = new scala.collection.mutable.ArrayBuffer[Row]()
            var i = g.fwdOff(u)
            while (i < g.fwdOff(u + 1)) {
              val w = g.fwdAdj(i)
              if (targetSet.contains(w)) out += Row(u.toLong, w.toLong)
              i += 1
            }
            out.iterator
          }
        case Reach =>
          val tr = o.targeted(bTargets.value)
          it.flatMap(u => tr.from(u).iterator.map(v => Row(u.toLong, v.toLong)))
      }
    }
    spark.createDataFrame(rows, schema)
  }
}
