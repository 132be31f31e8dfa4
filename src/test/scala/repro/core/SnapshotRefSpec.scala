package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil._

/** The snapshot-semantics reference itself must reproduce the paper's
  * example — it is the definitional ground truth used against NJ and TA.
  */
class SnapshotRefSpec extends AnyFunSuite {

  private val theta: SnapshotRef.Theta = (f1, f2) => f1("loc") == f2("loc")

  private def canon(o: RefOut) =
    (o.leftFact.map(_("name")).getOrElse("-"),
      o.rightFact.map(_("hotel")).getOrElse("-"),
      Lineage.canonicalString(o.lin),
      math.rint(o.p * 1e9) / 1e9, o.ts, o.te)

  test("anti join matches Fig. 3") {
    val got = SnapshotRef.anti(aRef, bRef, theta).map(canon).toSet
    assert(got == Set(
      ("Ann", "-", "a1", 0.7, 2L, 4L),
      ("Ann", "-", Lineage.canonicalString("a1&!b3"), 0.21, 4L, 5L),
      ("Ann", "-", Lineage.canonicalString("a1&!(b3|b2)"), 0.084, 5L, 6L),
      ("Ann", "-", Lineage.canonicalString("a1&!b2"), 0.28, 6L, 8L),
      ("Jim", "-", "a2", 0.8, 7L, 10L)))
  }

  test("left outer join matches Fig. 1b") {
    val got = SnapshotRef.leftOuter(aRef, bRef, theta).map(canon).toSet
    assert(got == Set(
      ("Ann", "-", "a1", 0.7, 2L, 4L),
      ("Ann", "hotel1", Lineage.canonicalString("a1&b3"), 0.49, 4L, 6L),
      ("Ann", "hotel2", Lineage.canonicalString("a1&b2"), 0.42, 5L, 8L),
      ("Ann", "-", Lineage.canonicalString("a1&!b3"), 0.21, 4L, 5L),
      ("Ann", "-", Lineage.canonicalString("a1&!(b3|b2)"), 0.084, 5L, 6L),
      ("Ann", "-", Lineage.canonicalString("a1&!b2"), 0.28, 6L, 8L),
      ("Jim", "-", "a2", 0.8, 7L, 10L)))
  }

  test("full outer adds the negated right side") {
    val got = SnapshotRef.fullOuter(aRef, bRef, theta).map(canon).toSet
    val left = SnapshotRef.leftOuter(aRef, bRef, theta).map(canon).toSet
    val extra = got -- left
    assert(extra == Set(
      ("-", "hotel3", "b1", 0.9, 1L, 4L),
      ("-", "hotel1", Lineage.canonicalString("b3&!a1"), 0.7 * 0.3, 4L, 6L),
      ("-", "hotel2", Lineage.canonicalString("b2&!a1"), 0.6 * 0.3, 5L, 8L)))
  }

  test("right outer = O windows plus negated right side") {
    val got = SnapshotRef.rightOuter(aRef, bRef, theta).map(canon).toSet
    assert(got.size == 5)
    assert(got.contains(("Ann", "hotel1", Lineage.canonicalString("a1&b3"), 0.49, 4L, 6L)))
    assert(got.contains(("-", "hotel3", "b1", 0.9, 1L, 4L)))
  }

  test("mergePoints produces maximal islands") {
    val rows = Seq(
      (1L, RefOut(Some(Map("k" -> "A")), None, "x", 0.5, 1, 2)),
      (2L, RefOut(Some(Map("k" -> "A")), None, "x", 0.5, 2, 3)),
      (5L, RefOut(Some(Map("k" -> "A")), None, "x", 0.5, 5, 6)))
    val merged = SnapshotRef.mergePoints(rows).map(o => (o.ts, o.te)).toSet
    assert(merged == Set((1L, 3L), (5L, 6L)))
  }

  test("mergePoints keeps different lineages apart") {
    val rows = Seq(
      (1L, RefOut(Some(Map("k" -> "A")), None, "x", 0.5, 1, 2)),
      (2L, RefOut(Some(Map("k" -> "A")), None, "y", 0.5, 2, 3)))
    val merged = SnapshotRef.mergePoints(rows).map(o => (o.lin, o.ts, o.te)).toSet
    assert(merged == Set(("x", 1L, 2L), ("y", 2L, 3L)))
  }

  test("output is change-preserved: no adjacent mergeable rows") {
    val out = SnapshotRef.leftOuter(aRef, bRef, theta)
    out.groupBy(o => (o.leftFact, o.rightFact, o.lin)).values.foreach { group =>
      val sorted = group.sortBy(_.ts)
      sorted.sliding(2).foreach {
        case Seq(x, y) => assert(x.te < y.ts, s"mergeable rows $x $y")
        case _ =>
      }
    }
  }
}
