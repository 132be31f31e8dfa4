package repro.ta

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestUtil}
import repro.TestUtil._
import repro.core._

/** The TA baseline must produce exactly the NJ results (same semantics,
  * different — redundant — plan shape), plus unit tests of Φ and N.
  */
class TemporalAlignmentSpec extends SparkSpec {

  private lazy val a = TestUtil.aDf(spark)
  private lazy val b = TestUtil.bDf(spark)
  private val theta = NegationJoin.thetaEq("loc")
  private val kTheta = NegationJoin.thetaEq("k")

  // --------------------------------------------------------------- align

  test("align replicates the paper's a by b: intersections plus gaps") {
    val got = TemporalAlignment.align(a, b, theta)
      .select("lin", "ts", "te").collect()
      .map(r => (r.getString(0), r.getLong(1), r.getLong(2))).toSet
    assert(got == Set(
      ("a1", 4L, 6L),  // a1 ∩ b3
      ("a1", 5L, 8L),  // a1 ∩ b2
      ("a1", 2L, 4L),  // gap before b3
      ("a2", 7L, 10L)  // fully unmatched
    ))
  }

  test("align of b by a clips to the matching tuples") {
    val got = TemporalAlignment.align(b, a, (o, i) => theta(i, o))
      .select("lin", "ts", "te").collect()
      .map(r => (r.getString(0), r.getLong(1), r.getLong(2))).toSet
    assert(got == Set(
      ("b3", 4L, 6L),   // b3 ∩ a1
      ("b2", 5L, 8L),   // b2 ∩ a1
      ("b1", 1L, 4L)    // unmatched
    ))
  }

  // ----------------------------------------------------------- normalize

  test("normalize splits a by all matching b boundaries") {
    val segs = TemporalAlignment.normalize(a, b, theta).collect()
      .map(s => (s.lr, s.ts, s.te)).toSet
    assert(segs == Set(
      ("a1", 2L, 4L), ("a1", 4L, 5L), ("a1", 5L, 6L), ("a1", 6L, 8L),
      ("a2", 7L, 10L)))
  }

  test("normalize with no matches returns the tuple unsplit") {
    import spark.implicits._
    val r = Seq(KTup("A", "x1", 0.5, 0, 10)).toDF()
    val s = Seq(KTup("B", "y1", 0.5, 2, 4)).toDF()
    val segs = TemporalAlignment.normalize(r, s, kTheta).collect()
    assert(segs.map(x => (x.ts, x.te)).toSet == Set((0L, 10L)))
  }

  // ------------------------------------------------- equivalence with NJ

  test("TA anti ≡ NJ anti on the paper example") {
    assert(canonSet(TemporalAlignment.anti(a, b, theta)) ==
      canonSet(NegationJoin(a, b, theta, TPJoinOp.Anti)))
  }

  test("TA left outer ≡ NJ left outer on the paper example") {
    assert(canonSet(TemporalAlignment.leftOuter(a, b, theta)) ==
      canonSet(NegationJoin(a, b, theta, TPJoinOp.LeftOuter)))
  }

  test("TA right outer ≡ NJ right outer on the paper example") {
    assert(canonSet(TemporalAlignment.rightOuter(a, b, theta)) ==
      canonSet(NegationJoin(a, b, theta, TPJoinOp.RightOuter)))
  }

  test("TA full outer ≡ NJ full outer on the paper example") {
    assert(canonSet(TemporalAlignment.fullOuter(a, b, theta)) ==
      canonSet(NegationJoin(a, b, theta, TPJoinOp.FullOuter)))
  }

  (1 to 8).foreach { seed =>
    test(s"TA ≡ NJ on all four ops over random relations (seed $seed)") {
      val r = kDf(spark, randomRelation(seed, Seq("A", "B", "C"), 30, 3, "x"))
      val s = kDf(spark, randomRelation(seed + 2000, Seq("A", "B", "C"), 30, 3, "y"))
      assert(canonSet(TemporalAlignment.anti(r, s, kTheta)) ==
        canonSet(NegationJoin(r, s, kTheta, TPJoinOp.Anti)), s"anti seed=$seed")
      assert(canonSet(TemporalAlignment.leftOuter(r, s, kTheta)) ==
        canonSet(NegationJoin(r, s, kTheta, TPJoinOp.LeftOuter)), s"left seed=$seed")
      assert(canonSet(TemporalAlignment.rightOuter(r, s, kTheta)) ==
        canonSet(NegationJoin(r, s, kTheta, TPJoinOp.RightOuter)), s"right seed=$seed")
      assert(canonSet(TemporalAlignment.fullOuter(r, s, kTheta)) ==
        canonSet(NegationJoin(r, s, kTheta, TPJoinOp.FullOuter)), s"full seed=$seed")
    }
  }

  test("TA windowsUO deduplicates replicas of identical intersections") {
    import spark.implicits._
    // two s tuples with identical overlap window against r would replicate r
    val r = Seq(KTup("A", "x1", 0.5, 0, 4)).toDF()
    val s = Seq(KTup("A", "y1", 0.5, 0, 4), KTup("A", "y2", 0.5, 0, 4)).toDF()
    val uo = TemporalAlignment.windowsUO(r, s, kTheta)
    // exactly two overlapping windows (x1,y1) and (x1,y2), no spurious rows
    assert(uo.filter(col("sfJson").isNotNull).count() == 2)
  }

  test("TA windowsUO produces no spurious sub-windows from third tuples") {
    import spark.implicits._
    // k=[0,10) vs m2=[0,10): true window is [0,10); k'=[0,5) and m1=[0,5)
    // create replicas with interval [0,5) that must NOT pair (k,m2).
    val r = Seq(KTup("A", "k", 0.5, 0, 10), KTup("A", "k2", 0.5, 0, 5)).toDF()
    val s = Seq(KTup("A", "m1", 0.5, 0, 5), KTup("A", "m2", 0.5, 0, 10)).toDF()
    val o = TemporalAlignment.windowsUO(r, s, kTheta).filter(col("sfJson").isNotNull)
      .select("lin", "ts", "te").collect()
      .map(x => (x.getString(0), x.getLong(1), x.getLong(2))).toSet
    assert(o == Set(
      ("k&m1", 0L, 5L), ("k&m2", 0L, 10L), ("k2&m1", 0L, 5L), ("k2&m2", 0L, 5L)))
  }
}
