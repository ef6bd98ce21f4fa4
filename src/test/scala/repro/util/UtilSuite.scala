package repro.util

import repro.SparkSpec

class TableFmtSuite extends org.scalatest.funsuite.AnyFunSuite {

  test("render aligns columns and includes every row") {
    val out = TableFmt.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = out.split("\n")
    assert(lines(0) == "== T ==")
    assert(lines.length == 5)
    assert(lines.drop(1).map(_.length).distinct.size == 1, "all rows same width")
    assert(out.contains("333"))
  }

  test("render tolerates ragged rows") {
    val out = TableFmt.render("T", Seq("a", "b", "c"), Seq(Seq("1")))
    assert(out.contains("1"))
  }

  test("fmtSec formats with two decimals") {
    assert(TableFmt.fmtSec(1.234) == "1.23")
    assert(TableFmt.fmtSec(0.0) == "0.00")
  }
}

class TimingSuite extends SparkSpec {

  test("time measures wall clock and returns the value") {
    val (v, sec) = Timing.time { Thread.sleep(30); 42 }
    assert(v == 42)
    assert(sec >= 0.02)
  }

  test("run classifies successful thunks as Solved with the row count") {
    Timing.run(spark, 30.0)(7L) match {
      case Timing.Solved(sec, rows) => assert(rows == 7L && sec >= 0.0)
      case other => fail(s"unexpected $other")
    }
  }

  test("run classifies SimulatedOOM, also when wrapped") {
    assert(Timing.run(spark, 30.0) { throw new Timing.SimulatedOOM("boom") }
      .isInstanceOf[Timing.OutOfMemory])
    assert(Timing.run(spark, 30.0) {
      throw new RuntimeException("outer", new Timing.SimulatedOOM("inner"))
    }.isInstanceOf[Timing.OutOfMemory])
  }

  test("run classifies QueryTimeout, also when wrapped") {
    assert(Timing.run(spark, 30.0) { throw new Timing.QueryTimeout("slow") }
      .isInstanceOf[Timing.TimedOut])
    assert(Timing.run(spark, 30.0) {
      throw new RuntimeException("outer", new Timing.QueryTimeout("inner"))
    }.isInstanceOf[Timing.TimedOut])
  }

  test("run classifies arbitrary exceptions as Failed") {
    Timing.run(spark, 30.0) { throw new IllegalStateException("nope") } match {
      case Timing.Failed(_, msg) => assert(msg.contains("nope"))
      case other => fail(s"unexpected $other")
    }
  }

  test("cooperative deadline stops a driver-side loop") {
    val out = Timing.run(spark, 0.2) {
      while (true) { Timing.checkDeadline(); Thread.sleep(5) }
      0L
    }
    assert(out.isInstanceOf[Timing.TimedOut])
    assert(out.seconds < 10.0)
  }

  test("outcome labels") {
    assert(Timing.Solved(1.234, 5).shortLabel == "1.23")
    assert(Timing.TimedOut(1.0).shortLabel == "TO")
    assert(Timing.OutOfMemory(1.0).shortLabel == "OM")
    assert(Timing.Failed(1.0, "x").shortLabel == "FA")
  }
}

class MaterializeDFSuite extends SparkSpec {

  test("checkpoint preserves rows and schema, severing lineage") {
    import spark.implicits._
    val df = Seq((1L, 2L), (3L, 4L)).toDF("src", "dst")
    val cp = MaterializeDF.checkpoint(spark, df)
    assert(cp.schema == df.schema)
    assert(cp.collect().map(_.toSeq).toSet == df.collect().map(_.toSeq).toSet)
  }

  test("checkpointed frames union without constraint-rewrite failures") {
    import spark.implicits._
    val a = MaterializeDF.checkpoint(spark, Seq((1L, 2L)).toDF("src", "dst"))
    val b = MaterializeDF.checkpoint(spark, Seq((3L, 4L)).toDF("src", "dst"))
    val u = a.unionByName(b).except(a)
    assert(u.count() == 1)
  }
}
