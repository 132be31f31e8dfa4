package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestUtil}
import repro.TestUtil._

/** The paper's running example, end to end: Fig. 1b (TP left outer join),
  * Fig. 3 (TP anti join), Fig. 5 (winit) and the window sets of Fig. 2/4.
  */
class NegationJoinSpec extends SparkSpec {

  private lazy val a = TestUtil.aDf(spark)
  private lazy val b = TestUtil.bDf(spark)
  private val theta = NegationJoin.thetaEq("loc")

  private def rows(df: org.apache.spark.sql.DataFrame): Set[Seq[String]] = canonSet(df)

  test("winit contains the overlapping windows of Fig. 5") {
    val x = NegationJoin.winitRows(a, b, theta).collect()
    val matched = x.filter(_.fs.isDefined)
    assert(matched.length == 2)
    val byLin = matched.map(m => (m.ls.get, (m.os.get, m.oe.get))).toMap
    assert(byLin("b3") == (4L, 6L))
    assert(byLin("b2") == (5L, 8L))
  }

  test("winit keeps fully-unmatched r tuples with null s side") {
    val x = NegationJoin.winitRows(a, b, theta).collect()
    val unmatched = x.filter(_.fs.isEmpty)
    assert(unmatched.length == 1)
    assert(unmatched.head.lr == "a2")
    assert((unmatched.head.rts, unmatched.head.rte) == (7L, 10L))
  }

  test("winit join interval is the pairwise intersection") {
    val x = NegationJoin.winitRows(a, b, theta).collect()
    x.filter(_.fs.isDefined).foreach { m =>
      assert(m.os.get >= m.rts && m.oe.get <= m.rte && m.os.get < m.oe.get)
    }
  }

  test("window sets match Fig. 2: unmatched windows w1, w2") {
    val wins = NegationJoin.windowsAll(a, b, theta).collect()
    val u = wins.filter(_.kind == "U").map(w => (w.lr, w.ts, w.te)).toSet
    assert(u == Set(("a1", 2L, 4L), ("a2", 7L, 10L)))
  }

  test("window sets match Fig. 2: overlapping windows w3, w4") {
    val wins = NegationJoin.windowsAll(a, b, theta).collect()
    val o = wins.filter(_.kind == "O").map(w => (w.lr, w.lsLins.head, w.ts, w.te)).toSet
    assert(o == Set(("a1", "b3", 4L, 6L), ("a1", "b2", 5L, 8L)))
  }

  test("window sets match Fig. 2: negating windows w5, w6, w7") {
    val wins = NegationJoin.windowsAll(a, b, theta).collect()
    val n = wins.filter(_.kind == "N").map(w => (w.lr, w.lsLins.mkString("|"), w.ts, w.te)).toSet
    assert(n == Set(
      ("a1", "b3", 4L, 5L),
      ("a1", "b2|b3", 5L, 6L),
      ("a1", "b2", 6L, 8L)))
  }

  test("TP anti join reproduces Fig. 3 exactly") {
    val out = NegationJoin(a, b, theta, TPJoinOp.Anti)
    assert(out.columns.toSeq == Seq("name", "loc", "lin", "p", "ts", "te"))
    val got = out.collect().map(r =>
      (r.getString(0), r.getString(1), r.getString(2),
        math.rint(r.getDouble(3) * 1e9) / 1e9, r.getLong(4), r.getLong(5))).toSet
    assert(got == Set(
      ("Ann", "ZAK", "a1", 0.7, 2L, 4L),
      ("Ann", "ZAK", "a1&!b3", 0.21, 4L, 5L),
      ("Ann", "ZAK", "a1&!(b2|b3)", 0.084, 5L, 6L),
      ("Ann", "ZAK", "a1&!b2", 0.28, 6L, 8L),
      ("Jim", "WEN", "a2", 0.8, 7L, 10L)))
  }

  test("TP left outer join reproduces Fig. 1b exactly") {
    val out = NegationJoin(a, b, theta, TPJoinOp.LeftOuter)
    assert(out.columns.toSeq == Seq("name", "loc", "hotel", "s_loc", "lin", "p", "ts", "te"))
    val got = out.collect().map(r =>
      (r.getString(0), r.getString(1), Option(r.getString(2)).getOrElse("-"),
        r.getString(4),
        math.rint(r.getDouble(5) * 1e9) / 1e9, r.getLong(6), r.getLong(7))).toSet
    assert(got == Set(
      ("Ann", "ZAK", "-", "a1", 0.7, 2L, 4L),
      ("Ann", "ZAK", "hotel1", "a1&b3", 0.49, 4L, 6L),
      ("Ann", "ZAK", "hotel2", "a1&b2", 0.42, 5L, 8L),
      ("Ann", "ZAK", "-", "a1&!b3", 0.21, 4L, 5L),
      ("Ann", "ZAK", "-", "a1&!(b2|b3)", 0.084, 5L, 6L),
      ("Ann", "ZAK", "-", "a1&!b2", 0.28, 6L, 8L),
      ("Jim", "WEN", "-", "a2", 0.8, 7L, 10L)))
  }

  test("TP right outer join: WO plus unmatched/negating of b w.r.t. a") {
    val out = NegationJoin(a, b, theta, TPJoinOp.RightOuter)
    val got = out.collect().map(r =>
      (Option(r.getString(0)).getOrElse("-"), Option(r.getString(2)).getOrElse("-"),
        Lineage.canonicalString(r.getString(4)),
        math.rint(r.getDouble(5) * 1e9) / 1e9, r.getLong(6), r.getLong(7))).toSet
    assert(got == Set(
      ("Ann", "hotel1", "a1&b3", 0.49, 4L, 6L),
      ("Ann", "hotel2", "a1&b2", 0.42, 5L, 8L),
      ("-", "hotel3", "b1", 0.9, 1L, 4L),
      ("-", "hotel1", "!a1&b3", 0.7 * 0.3, 4L, 6L),
      ("-", "hotel2", "!a1&b2", 0.6 * 0.3, 5L, 8L)))
  }

  test("TP full outer join = left outer ∪ negated right side") {
    val full = NegationJoin(a, b, theta, TPJoinOp.FullOuter)
    val left = NegationJoin(a, b, theta, TPJoinOp.LeftOuter)
    val right = NegationJoin(a, b, theta, TPJoinOp.RightOuter)
    val fullSet = rows(full)
    val leftSet = rows(left)
    val rightOnly = rows(right.filter(col("name").isNull))
    assert(fullSet == leftSet ++ rightOnly)
    assert(fullSet.size == leftSet.size + rightOnly.size)
  }

  test("anti join of disjoint relations passes r through unchanged") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 0, 10)).toDF()
    val s = Seq(KTup("B", "y1", 0.5, 0, 10)).toDF()
    val out = NegationJoin(r, s, NegationJoin.thetaEq("k"), TPJoinOp.Anti).collect()
    assert(out.length == 1)
    assert(out.head.getString(0) == "A" && out.head.getString(1) == "x1")
    assert(out.head.getLong(3) == 0L && out.head.getLong(4) == 10L)
  }

  test("matching tuple with probability 1 yields probability-0 negation row") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 0, 10)).toDF()
    val s = Seq(KTup("A", "y1", 1.0, 0, 10)).toDF()
    val out = NegationJoin(r, s, NegationJoin.thetaEq("k"), TPJoinOp.Anti).collect()
    assert(out.length == 1)
    assert(out.head.getDouble(2) == 0.0)
    assert(out.head.getString(1) == "x1&!y1")
  }

  test("s tuple strictly inside r splits r into five windows for left outer") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 0, 10)).toDF()
    val s = Seq(KTup("A", "y1", 0.4, 3, 6)).toDF()
    val out = NegationJoin(r, s, NegationJoin.thetaEq("k"), TPJoinOp.LeftOuter)
    val got = out.select("lin", "ts", "te").collect()
      .map(x => (x.getString(0), x.getLong(1), x.getLong(2))).toSet
    assert(got == Set(
      ("x1", 0L, 3L), ("x1&y1", 3L, 6L), ("x1&!y1", 3L, 6L), ("x1", 6L, 10L)))
  }

  test("identical intervals produce only overlap and negation windows") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 2, 9)).toDF()
    val s = Seq(KTup("A", "y1", 0.4, 2, 9)).toDF()
    val out = NegationJoin(r, s, NegationJoin.thetaEq("k"), TPJoinOp.LeftOuter)
    val got = out.select("lin", "ts", "te").collect()
      .map(x => (x.getString(0), x.getLong(1), x.getLong(2))).toSet
    assert(got == Set(("x1&y1", 2L, 9L), ("x1&!y1", 2L, 9L)))
  }

  test("left outer probability columns: O rows pr*ps, N rows pr*(1-ps)") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 2, 9)).toDF()
    val s = Seq(KTup("A", "y1", 0.4, 2, 9)).toDF()
    val out = NegationJoin(r, s, NegationJoin.thetaEq("k"), TPJoinOp.LeftOuter)
      .select("lin", "p").collect().map(x => (x.getString(0), x.getDouble(1))).toMap
    assert(math.abs(out("x1&y1") - 0.2) < 1e-12)
    assert(math.abs(out("x1&!y1") - 0.3) < 1e-12)
  }

  test("three stacked s tuples produce pairwise O windows and set-based N windows") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 0, 10)).toDF()
    val s = Seq(
      KTup("A", "y1", 0.5, 0, 4),
      KTup("A", "y2", 0.5, 2, 8),
      KTup("A", "y3", 0.5, 6, 10)).toDF()
    val wins = NegationJoin.windowsAll(r, s, NegationJoin.thetaEq("k")).collect()
    val n = wins.filter(_.kind == "N").map(w => (w.lsLins.mkString("|"), w.ts, w.te)).toSet
    assert(n == Set(
      ("y1", 0L, 2L), ("y1|y2", 2L, 4L), ("y2", 4L, 6L),
      ("y2|y3", 6L, 8L), ("y3", 8L, 10L)))
    assert(wins.count(_.kind == "U") == 0)
    assert(wins.count(_.kind == "O") == 3)
  }

  test("theta on non-equal attributes (inequality) is honored") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 0, 10)).toDF()
    val s = Seq(KTup("A", "y1", 0.5, 0, 10), KTup("B", "y2", 0.5, 0, 10)).toDF()
    val thetaNe: (String, String) => Column =
      (l, rr) => col(s"$l.k") =!= col(s"$rr.k")
    val out = NegationJoin(r, s, thetaNe, TPJoinOp.Anti).collect()
    assert(out.length == 1)
    assert(out.head.getString(1) == "x1&!y2")
  }

  type Column = org.apache.spark.sql.Column
}
