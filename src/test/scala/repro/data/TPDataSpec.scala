package repro.data

import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Generator sanity: duplicate-freeness, determinism, the shift invariants,
  * and the Table IV statistics computation.
  */
class TPDataSpec extends SparkSpec {

  import spark.implicits._

  private def overlapsWithinFact(df: org.apache.spark.sql.DataFrame, factCols: Seq[String]): Long = {
    val w = Window.partitionBy(factCols.map(col): _*).orderBy(col("ts"))
    df.withColumn("_prevTe", lag(col("te"), 1).over(w))
      .filter(col("_prevTe").isNotNull && col("ts") < col("_prevTe"))
      .count()
  }

  test("webkitLite is duplicate-free (per-fact intervals disjoint)") {
    val df = TPData.webkitLite(spark, 3000, seed = 1)
    assert(overlapsWithinFact(df, Seq("file")) == 0)
  }

  test("webkitLite has ~n/3 facts and n tuples") {
    val df = TPData.webkitLite(spark, 3000, seed = 1)
    assert(df.count() == 3000)
    val facts = df.select(countDistinct(col("file"))).as[Long].head()
    assert(facts == 1000)
  }

  test("webkitLite intervals are non-empty and chains are adjacent or increasing") {
    val df = TPData.webkitLite(spark, 2000, seed = 2)
    assert(df.filter(col("ts") >= col("te")).count() == 0)
  }

  test("webkitLite lineage ids are unique") {
    val df = TPData.webkitLite(spark, 2000, seed = 3)
    assert(df.select(countDistinct(col("lin"))).as[Long].head() == 2000)
  }

  test("webkitLite probabilities are in (0,1)") {
    val df = TPData.webkitLite(spark, 2000, seed = 4)
    assert(df.filter(col("p") <= 0.0 || col("p") >= 1.0).count() == 0)
  }

  test("webkitLite is deterministic in (n, seed)") {
    val h1 = TPData.webkitLite(spark, 500, seed = 9).orderBy("lin").collect().mkString
    val h2 = TPData.webkitLite(spark, 500, seed = 9).orderBy("lin").collect().mkString
    assert(h1 == h2)
  }

  test("meteoLite is duplicate-free") {
    val df = TPData.meteoLite(spark, 3200, seed = 1)
    assert(overlapsWithinFact(df, Seq("station", "metric")) == 0)
  }

  test("meteoLite has exactly 320 facts once n >= 320") {
    val df = TPData.meteoLite(spark, 3200, seed = 1)
    val facts = df.select(countDistinct(col("station"), col("metric"))).as[Long].head()
    assert(facts == 320)
  }

  test("meteoLite stations in [0,80), metrics in [0,4)") {
    val df = TPData.meteoLite(spark, 2000, seed = 2)
    assert(df.filter(col("station") < 0 || col("station") >= 80).count() == 0)
    assert(df.filter(col("metric") < 0 || col("metric") >= 4).count() == 0)
  }

  test("meteoLite durations are short and sparse (1..12 within 100-slots)") {
    val df = TPData.meteoLite(spark, 2000, seed = 3)
    val durs = df.select((col("te") - col("ts")).as[Long]).collect()
    assert(durs.forall(d => d >= 1 && d <= 12))
  }

  test("shifted preserves interval lengths and cardinality") {
    val df = TPData.webkitLite(spark, 1000, seed = 5)
    val sh = TPData.shifted(df, Seq("file"), maxShift = 50, seed = 6)
    assert(sh.count() == 1000)
    val origLens = df.select((col("te") - col("ts")).as("d")).groupBy("d").count()
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val shLens = sh.select((col("te") - col("ts")).as("d")).groupBy("d").count()
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(origLens == shLens)
  }

  test("shifted keeps the relation duplicate-free") {
    val sh = TPData.shifted(TPData.webkitLite(spark, 2000, seed = 7), Seq("file"), 100, seed = 8)
    assert(overlapsWithinFact(sh, Seq("file")) == 0)
  }

  test("shifted assigns fresh lineage identifiers") {
    val df = TPData.webkitLite(spark, 500, seed = 9)
    val sh = TPData.shifted(df, Seq("file"), 50, seed = 10, idPrefix = "s")
    val ids = df.select("lin").as[String].collect().toSet
    val shIds = sh.select("lin").as[String].collect().toSet
    assert(ids.intersect(shIds).isEmpty)
    assert(shIds.size == 500)
  }

  test("stats computes every Table IV property correctly on a known relation") {
    val df = Seq(
      ("A", "t1", 0.5, 0L, 4L),   // dur 4
      ("A", "t2", 0.5, 4L, 8L),   // dur 4
      ("B", "t3", 0.5, 2L, 12L)   // dur 10
    ).toDF("k", "lin", "p", "ts", "te")
    val st = TPData.stats(df, Seq("k"))
    assert(st.cardinality == 3)
    assert(st.timeRange == 12)
    assert(st.minDuration == 4 && st.maxDuration == 10)
    assert(math.abs(st.avgDuration - 6.0) < 1e-9)
    assert(st.numFacts == 2)
    // distinct boundary points: 0,2,4,8,12 — point 4 carries two boundaries
    assert(st.distinctPoints == 5)
    assert(st.maxTuplesPerPoint == 2)
    assert(math.abs(st.avgTuplesPerPoint - 6.0 / 5) < 1e-9)
  }

  test("meteoLite boundaries collide across series (avg tuples per point > 1)") {
    val st = TPData.stats(TPData.meteoLite(spark, 6400, seed = 1), Seq("station", "metric"))
    assert(st.avgTuplesPerPoint > 1.5 && st.avgTuplesPerPoint < 80, st.toString)
  }

  test("webkitLite and its shifted partner overlap substantially") {
    val r = TPData.webkitLite(spark, 1000, seed = 11)
    val s = TPData.shifted(r, Seq("file"), maxShift = 20, seed = 12)
    val overlapping = r.as("_l").join(s.as("_r"),
      col("_l.file") === col("_r.file") &&
        col("_l.ts") < col("_r.te") && col("_r.ts") < col("_l.te")).count()
    assert(overlapping > 200, s"only $overlapping overlapping pairs")
  }
}
