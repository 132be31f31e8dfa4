package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestUtil}
import repro.TestUtil._

/** Edge cases of the conventional `winit` join (the CLJ node): strict
  * half-open overlap semantics, null padding, fact packing.
  */
class WinitSpec extends SparkSpec {

  import spark.implicits._
  private val theta = NegationJoin.thetaEq("k")

  private def winit(r: Seq[KTup], s: Seq[KTup]) =
    NegationJoin.winitRows(r.toDF(), s.toDF(), theta).collect()

  test("touching intervals [0,5) and [5,9) do not overlap") {
    val x = winit(Seq(KTup("A", "x", 0.5, 0, 5)), Seq(KTup("A", "y", 0.5, 5, 9)))
    assert(x.length == 1 && x.head.fs.isEmpty)
  }

  test("one-point overlap [0,5) and [4,9) yields os=4, oe=5") {
    val x = winit(Seq(KTup("A", "x", 0.5, 0, 5)), Seq(KTup("A", "y", 0.5, 4, 9)))
    assert(x.length == 1)
    assert((x.head.os, x.head.oe) == (Some(4L), Some(5L)))
  }

  test("containment clips to the inner interval") {
    val x = winit(Seq(KTup("A", "x", 0.5, 0, 10)), Seq(KTup("A", "y", 0.5, 3, 6)))
    assert((x.head.os, x.head.oe) == (Some(3L), Some(6L)))
  }

  test("identical unit intervals overlap on themselves") {
    val x = winit(Seq(KTup("A", "x", 0.5, 7, 8)), Seq(KTup("A", "y", 0.5, 7, 8)))
    assert((x.head.os, x.head.oe) == (Some(7L), Some(8L)))
  }

  test("θ mismatch yields a null-padded row even when intervals overlap") {
    val x = winit(Seq(KTup("A", "x", 0.5, 0, 9)), Seq(KTup("B", "y", 0.5, 0, 9)))
    assert(x.length == 1 && x.head.ls.isEmpty && x.head.os.isEmpty)
  }

  test("an r tuple with several matches produces one row per match plus none padded") {
    val x = winit(
      Seq(KTup("A", "x", 0.5, 0, 10)),
      Seq(KTup("A", "y1", 0.5, 1, 3), KTup("A", "y2", 0.5, 5, 7), KTup("B", "z", 0.5, 0, 10)))
    assert(x.count(_.ls.isDefined) == 2)
    assert(x.count(_.ls.isEmpty) == 0)
  }

  test("facts are packed as JSON with the fact column name") {
    val x = winit(Seq(KTup("A", "x", 0.5, 0, 2)), Seq.empty)
    assert(x.head.fr.contains("\"k\":\"A\""))
  }

  test("winit preserves the r tuple's full interval in rts/rte") {
    val x = winit(Seq(KTup("A", "x", 0.25, 2, 11)), Seq(KTup("A", "y", 0.5, 4, 6)))
    assert((x.head.rts, x.head.rte, x.head.pr) == (2L, 11L, 0.25))
  }

  test("swap=true makes s the outer relation") {
    val r = Seq(KTup("A", "x", 0.5, 0, 4)).toDF()
    val s = Seq(KTup("A", "y", 0.5, 2, 8), KTup("C", "z", 0.5, 0, 2)).toDF()
    val x = NegationJoin.winitRows(r, s, theta, swap = true).collect()
    assert(x.map(_.lr).toSet == Set("y", "z"))
    val yRow = x.find(_.lr == "y").get
    assert(yRow.ls.contains("x") && (yRow.os, yRow.oe) == (Some(2L), Some(4L)))
    assert(x.find(_.lr == "z").get.ls.isEmpty)
  }

  test("multi-column facts survive the JSON round trip") {
    val a = TestUtil.aDf(spark)
    val b = TestUtil.bDf(spark)
    val out = NegationJoin(a, b, NegationJoin.thetaEq("loc"), TPJoinOp.LeftOuter)
    val row = out.filter(col("hotel") === "hotel1").collect().head
    assert(row.getString(0) == "Ann" && row.getString(1) == "ZAK" && row.getString(3) == "ZAK")
  }

  test("long fact values with quotes survive JSON packing") {
    val r = Seq(KTup("""A "quoted" fact""", "x", 0.5, 0, 5)).toDF()
    val s = Seq.empty[KTup].toDF()
    val out = NegationJoin(r, s, theta, TPJoinOp.Anti).collect()
    assert(out.head.getString(0) == """A "quoted" fact""")
  }
}
