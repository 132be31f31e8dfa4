package repro.exp

import repro.SparkSpec

/** Tiny-scale runs of the experiment harness: every experiment function
  * must execute end to end, and its internal NJ-vs-TA cardinality
  * consistency checks must hold (they `require` inside).
  */
class ExperimentsSpec extends SparkSpec {

  private val tiny = Map("webkit" -> Seq(1500L), "meteo" -> Seq(1000L))

  test("table4 returns one row per dataset with positive stats") {
    val rows = Experiments.table4(spark, 2000, 2000)
    assert(rows.size == 2)
    assert(rows.forall(r => r(1).toString.toLong == 2000))
  }

  test("fig11 runs and NJ/TA window counts agree") {
    val rows = Experiments.fig11(spark, tiny, reps = 1, warmup = 0)
    assert(rows.size == 2)
    assert(rows.forall(_(2).toString.toLong > 0))
  }

  test("fig12 runs and TA N-subtree cardinality matches NJ") {
    val rows = Experiments.fig12(spark, tiny, reps = 1, warmup = 0)
    assert(rows.size == 2)
    assert(rows.forall(_(2).toString.toLong > 0))
  }

  test("fig13 runs and NJ/TA left-outer cardinalities agree") {
    val rows = Experiments.fig13(spark, tiny, reps = 1, warmup = 0)
    assert(rows.size == 2)
  }

  test("fig14 percentages are sane") {
    val rows = Experiments.fig14(spark, Map("webkit" -> Seq(1500L)), reps = 1, warmup = 0)
    assert(rows.size == 1)
    val pcts = rows.head.drop(3).map(_.toString.stripSuffix("%").toDouble)
    assert(pcts.forall(p => p >= 0 && p <= 100))
  }

  test("fig15 runs on a tiny size") {
    val rows = Experiments.fig15(spark, Map("meteo" -> Seq(1000L)), reps = 1, warmup = 0)
    assert(rows.size == 1)
    assert(rows.head(2).toString.toLong > 0)
  }

  test("workload inputs are duplicate-free TP relations") {
    val w = Experiments.workload(spark, "meteo", 1000)
    import org.apache.spark.sql.expressions.Window
    import org.apache.spark.sql.functions._
    val win = Window.partitionBy(col("station"), col("metric")).orderBy(col("ts"))
    Seq(w.r, w.s).foreach { df =>
      val bad = df.withColumn("_prev", lag(col("te"), 1).over(win))
        .filter(col("_prev").isNotNull && col("ts") < col("_prev")).count()
      assert(bad == 0)
    }
    Experiments.release(w)
  }
}
