package repro.core

import repro.SparkSpec
import repro.TestUtil._

/** Gaps-and-islands coalescing: TP change preservation as a utility. */
class ChangePreserveSpec extends SparkSpec {

  import spark.implicits._

  private def rows(df: org.apache.spark.sql.DataFrame) =
    df.collect().map(r => (r.getString(0), r.getString(1), r.getDouble(2), r.getLong(3), r.getLong(4))).toSet

  test("merges adjacent rows with equal fact, lineage and probability") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 4),
      KTup("A", "x", 0.5, 4, 9)).toDF()
    assert(rows(ChangePreserve.coalesce(df)) == Set(("A", "x", 0.5, 0L, 9L)))
  }

  test("keeps gap-separated rows apart") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 4),
      KTup("A", "x", 0.5, 5, 9)).toDF()
    assert(ChangePreserve.coalesce(df).count() == 2)
  }

  test("keeps rows with different lineage apart") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 4),
      KTup("A", "y", 0.5, 4, 9)).toDF()
    assert(ChangePreserve.coalesce(df).count() == 2)
  }

  test("keeps rows with different facts apart") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 4),
      KTup("B", "x", 0.5, 4, 9)).toDF()
    assert(ChangePreserve.coalesce(df).count() == 2)
  }

  test("merges chains of three adjacent rows") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 2),
      KTup("A", "x", 0.5, 2, 5),
      KTup("A", "x", 0.5, 5, 7)).toDF()
    assert(rows(ChangePreserve.coalesce(df)) == Set(("A", "x", 0.5, 0L, 7L)))
  }

  test("absorbs overlapping duplicates into one interval") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 6),
      KTup("A", "x", 0.5, 4, 9)).toDF()
    assert(rows(ChangePreserve.coalesce(df)) == Set(("A", "x", 0.5, 0L, 9L)))
  }

  test("is idempotent") {
    val df = Seq(
      KTup("A", "x", 0.5, 0, 2), KTup("A", "x", 0.5, 2, 5),
      KTup("A", "y", 0.5, 6, 8), KTup("B", "x", 0.5, 0, 3)).toDF()
    val once = ChangePreserve.coalesce(df)
    assert(canonSet(once) == canonSet(ChangePreserve.coalesce(once)))
  }

  test("no-op on the NJ left outer join of the paper example") {
    val out = NegationJoin(
      repro.TestUtil.aDf(spark), repro.TestUtil.bDf(spark),
      NegationJoin.thetaEq("loc"), TPJoinOp.LeftOuter)
    assert(canonSet(out) == canonSet(ChangePreserve.coalesce(out)))
  }

  test("no-op on the NJ anti join of the paper example") {
    val out = NegationJoin(
      repro.TestUtil.aDf(spark), repro.TestUtil.bDf(spark),
      NegationJoin.thetaEq("loc"), TPJoinOp.Anti)
    assert(canonSet(out) == canonSet(ChangePreserve.coalesce(out)))
  }

  (1 to 5).foreach { seed =>
    test(s"no-op on NJ full outer join of random relations (seed $seed)") {
      val r = kDf(spark, randomRelation(seed, Seq("A", "B"), 25, 3, "x"))
      val s = kDf(spark, randomRelation(seed + 500, Seq("A", "B"), 25, 3, "y"))
      val out = NegationJoin(r, s, NegationJoin.thetaEq("k"), TPJoinOp.FullOuter)
      assert(canonSet(out) == canonSet(ChangePreserve.coalesce(out)))
    }
  }
}
