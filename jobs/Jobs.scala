package repro.jobs

import repro.bench._

/** spark-submit entrypoints, one per reproduced table.
  *
  * Example:
  *   spark-submit --class repro.jobs.Table3Job target/scala-2.13/repro_2.13-0.1.0-SNAPSHOT.jar
  *
  * Scaling knobs are read from the environment (see [[repro.bench.BenchEnv]]).
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val (_, out) = Table2Harness.run()
    println(out)
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = BenchEnv.newSession("table3")
    try println(Table3Harness.run(spark)._2) finally spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = BenchEnv.newSession("table4")
    try println(Table4Harness.run(spark)._2) finally spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = BenchEnv.newSession("table5")
    try println(Table5Harness.run(spark)._2) finally spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = BenchEnv.newSession("table6")
    try println(Table6Harness.run(spark)._2) finally spark.stop()
  }
}

object Fig18Job {
  def main(args: Array[String]): Unit = {
    val spark = BenchEnv.newSession("fig18")
    try {
      println(Fig18Harness.runBuild(spark)._2)
      println(Fig18Harness.runQueries(spark)._2)
    } finally spark.stop()
  }
}
