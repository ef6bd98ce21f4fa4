package repro.bench

import org.apache.spark.sql.SparkSession
import repro.graph.{Graph, GraphGen}
import repro.graph.reach.{BFL, ReachOps}

/** Shared bench configuration and dataset cache.
  *
  * Scaling knobs (all env-overridable) adapt the paper's workstation-scale
  * experiments (10-minute timeout, 16 GB JVM, full SNAP graphs) to the
  * containerized Spark-local run; EXPERIMENTS.md records the mapping.
  *
  *  - REPRO_SCALE        node/edge scale of the medium/large graphs (default 0.25)
  *  - REPRO_TIMEOUT_SEC  per-query wall budget (default 60; paper: 600)
  *  - REPRO_BUDGET_ROWS  intermediate-row budget modelling OOM (default 2M)
  *  - REPRO_LIMIT        match-count cap (default 1e5; paper: 1e7)
  */
object BenchEnv {

  def scale: Double = sys.env.getOrElse("REPRO_SCALE", "0.25").toDouble
  def timeoutSec: Double = sys.env.getOrElse("REPRO_TIMEOUT_SEC", "60").toDouble
  def budgetRows: Long = sys.env.getOrElse("REPRO_BUDGET_ROWS", "2000000").toLong
  def limit: Long = sys.env.getOrElse("REPRO_LIMIT", "100000").toLong

  /** Per-dataset scale: biology graphs are small enough to run paper-sized. */
  def scaleFor(name: String): Double =
    if (Set("yt", "hu", "hp").contains(name)) 1.0 else scale

  private val graphCache = scala.collection.mutable.Map.empty[(String, Double), Graph]
  private val opsCache = scala.collection.mutable.Map.empty[(String, Double), ReachOps]
  private val bflCache = scala.collection.mutable.Map.empty[(String, Double), BFL]

  def graph(name: String): Graph = synchronized {
    val s = scaleFor(name)
    graphCache.getOrElseUpdate((name, s), GraphGen.dataset(name, s))
  }

  def ops(name: String): ReachOps = synchronized {
    val s = scaleFor(name)
    opsCache.getOrElseUpdate((name, s), ReachOps(graph(name)))
  }

  def bfl(name: String): BFL = synchronized {
    val s = scaleFor(name)
    val o = ops(name)
    bflCache.getOrElseUpdate((name, s), BFL.build(o.g, o.cond))
  }

  /** Drop Spark log noise so bench tables stay readable. */
  def quiet(spark: SparkSession): Unit =
    spark.sparkContext.setLogLevel("WARN")

  /** Stand-alone SparkSession for `jobs/` entrypoints. */
  def newSession(appName: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()
}
