package repro.core

import org.apache.spark.sql.DataFrame
import repro.{SparkSpec, TestUtil}
import repro.TestUtil._

/** Randomized cross-check: the NJ operator must agree with the independent
  * snapshot-semantics reference on every op, over many random duplicate-free
  * TP relations (facts A–C, horizon 30). Lineages are compared canonically
  * (order-insensitive), probabilities to 1e-9.
  */
class NJvsRefSpec extends SparkSpec {

  private val theta = NegationJoin.thetaEq("k")
  private val refTheta: SnapshotRef.Theta = (f1, f2) => f1("k") == f2("k")

  private def canonNj(df: DataFrame, anti: Boolean): Set[(String, String, String, Double, Long, Long)] =
    df.collect().map { r =>
      if (anti)
        (r.getString(0), "∅", Lineage.canonicalString(r.getString(1)),
          math.rint(r.getDouble(2) * 1e9) / 1e9, r.getLong(3), r.getLong(4))
      else
        (Option(r.getString(0)).getOrElse("∅"), Option(r.getString(1)).getOrElse("∅"),
          Lineage.canonicalString(r.getString(2)),
          math.rint(r.getDouble(3) * 1e9) / 1e9, r.getLong(4), r.getLong(5))
    }.toSet

  private def canonRef(out: Seq[RefOut], anti: Boolean): Set[(String, String, String, Double, Long, Long)] =
    out.map { o =>
      (o.leftFact.map(_("k")).getOrElse("∅"),
        if (anti) "∅" else o.rightFact.map(_("k")).getOrElse("∅"),
        Lineage.canonicalString(o.lin),
        math.rint(o.p * 1e9) / 1e9, o.ts, o.te)
    }.toSet

  private def check(seed: Int): Unit = {
    val rTs = randomRelation(seed, Seq("A", "B", "C"), 30, 3, "x")
    val sTs = randomRelation(seed + 1000, Seq("A", "B", "C"), 30, 3, "y")
    val r = kDf(spark, rTs)
    val s = kDf(spark, sTs)
    val (rr, ss) = (kRef(rTs), kRef(sTs))

    assert(canonNj(NegationJoin(r, s, theta, TPJoinOp.Anti), anti = true) ==
      canonRef(SnapshotRef.anti(rr, ss, refTheta), anti = true), s"anti seed=$seed")
    assert(canonNj(NegationJoin(r, s, theta, TPJoinOp.LeftOuter), anti = false) ==
      canonRef(SnapshotRef.leftOuter(rr, ss, refTheta), anti = false), s"left seed=$seed")
    assert(canonNj(NegationJoin(r, s, theta, TPJoinOp.RightOuter), anti = false) ==
      canonRef(SnapshotRef.rightOuter(rr, ss, refTheta), anti = false), s"right seed=$seed")
    assert(canonNj(NegationJoin(r, s, theta, TPJoinOp.FullOuter), anti = false) ==
      canonRef(SnapshotRef.fullOuter(rr, ss, refTheta), anti = false), s"full seed=$seed")
  }

  (1 to 12).foreach { seed =>
    test(s"NJ ≡ SnapshotRef on all four ops (seed $seed)") { check(seed) }
  }

  test("NJ ≡ SnapshotRef with empty negative relation") {
    val rTs = randomRelation(99, Seq("A", "B"), 20, 3, "x")
    val r = kDf(spark, rTs)
    val s = kDf(spark, Seq.empty[KTup])
    val got = canonNj(NegationJoin(r, s, theta, TPJoinOp.Anti), anti = true)
    val exp = canonRef(SnapshotRef.anti(kRef(rTs), Nil, refTheta), anti = true)
    assert(got == exp)
    // anti join against empty s passes everything through
    assert(got.size == rTs.size)
  }

  test("NJ ≡ SnapshotRef with empty positive relation") {
    val sTs = randomRelation(98, Seq("A", "B"), 20, 3, "y")
    val r = kDf(spark, Seq.empty[KTup])
    val s = kDf(spark, sTs)
    assert(NegationJoin(r, s, theta, TPJoinOp.Anti).count() == 0)
    assert(canonNj(NegationJoin(r, s, theta, TPJoinOp.FullOuter), anti = false) ==
      canonRef(SnapshotRef.fullOuter(Nil, kRef(sTs), refTheta), anti = false))
  }

  test("NJ output is duplicate-free and change-preserved on random input") {
    val rTs = randomRelation(55, Seq("A", "B", "C"), 30, 3, "x")
    val sTs = randomRelation(56, Seq("A", "B", "C"), 30, 3, "y")
    val out = NegationJoin(kDf(spark, rTs), kDf(spark, sTs), theta, TPJoinOp.LeftOuter)
    val coalesced = ChangePreserve.coalesce(out)
    assert(canonSet(out) == canonSet(coalesced))
    assert(out.count() == coalesced.count())
  }
}
