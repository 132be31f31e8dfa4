package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** Synthetic TP relations emulating the paper's two real datasets (§VII-B)
  * plus the Table IV statistics.
  *
  * All generators are deterministic in (n, seed) — pseudo-randomness comes
  * from `xxhash64`, so Spark and the DuckDB oracle see identical data. Every
  * relation has the TP schema: fact columns + `lin` (unique tuple id), `p`
  * (probability in (0,1)), `ts`, `te` (half-open Long interval), and is
  * duplicate-free by construction (per-fact intervals are disjoint).
  *
  * Dataset substitutions (documented in DESIGN.md §4):
  *
  *  - [[webkitLite]] ~ the Webkit SVN history: one fact per file
  *    (#facts ≈ n/3), per-file chains of adjacent variable-length revision
  *    intervals with per-file duration scales (long-tailed durations);
  *    θ is `file` equality ⇒ highly selective.
  *  - [[meteoLite]] ~ the Meteo Swiss archive: 80 stations × 4 metrics =
  *    320 facts, long per-series histories of short sparse intervals
  *    (~12% occupancy ⇒ ~38 valid tuples per time point, cf. the paper's
  *    avg 37); θ is equal metric ∧ different station ⇒ low selectivity.
  *  - [[shifted]] builds the partner relation the way the paper did:
  *    interval lengths preserved, start points shifted (per fact, so the
  *    result stays duplicate-free).
  */
object TPData {

  /** Pseudo-random Long in [0, m) derived from hashed columns. */
  private def h(m: Long, seed: Long, cols: org.apache.spark.sql.Column*) =
    pmod(xxhash64(cols :+ lit(seed): _*), lit(m))

  /** Webkit-like relation: schema (file, lin, p, ts, te). */
  def webkitLite(spark: SparkSession, n: Long, seed: Long = 0, idPrefix: String = "w"): DataFrame = {
    val nFacts = math.max(1L, n / 3)
    val base = spark.range(n).select(
      concat(lit("f"), col("id") % nFacts).as("file"),
      (col("id") / nFacts).cast(LongType).as("rev"),
      col("id"))
    val w = Window.partitionBy(col("file")).orderBy(col("rev"))
    base
      .withColumn("durScale", h(200, seed, col("file")) + 1)
      .withColumn("dur", h(40, seed + 1, col("file"), col("rev")) * col("durScale") + 1)
      .withColumn("te", sum(col("dur")).over(w))
      .withColumn("ts", col("te") - col("dur"))
      .select(
        col("file"),
        concat(lit(idPrefix), col("id")).as("lin"),
        (h(98, seed + 2, col("id")) + 1).cast("double") / 100.0 as "p",
        col("ts"), col("te"))
  }

  /** Meteo-like relation: schema (station, metric, lin, p, ts, te).
    *
    * 320 series; slot `idx` of a series occupies a short interval inside
    * `[idx*100, (idx+1)*100)` — ~12% time occupancy per series.
    */
  def meteoLite(spark: SparkSession, n: Long, seed: Long = 0, idPrefix: String = "m"): DataFrame = {
    val series = 320L
    spark.range(n).select(
      (col("id") % series % 80).as("station"),
      (col("id") % series / 80).cast(LongType).as("metric"),
      (col("id") / series).cast(LongType).as("idx"),
      col("id"))
      .withColumn("ts", col("idx") * 100 + h(40, seed, col("id")))
      .withColumn("te", col("ts") + h(12, seed + 1, col("id")) + 1)
      .select(
        col("station"), col("metric"),
        concat(lit(idPrefix), col("id")).as("lin"),
        (h(98, seed + 2, col("id")) + 1).cast("double") / 100.0 as "p",
        col("ts"), col("te"))
  }

  /** Partner relation: same facts and interval lengths, start points shifted
    * by a per-fact offset in [-maxShift, maxShift) (paper §VII-B: "shifting
    * the intervals of the original dataset, without modifying the lengths").
    * Tuples get fresh identifiers and probabilities.
    */
  def shifted(df: DataFrame, factCols: Seq[String], maxShift: Long,
              seed: Long = 7, idPrefix: String = "s"): DataFrame = {
    val off = h(2 * maxShift, seed, factCols.map(col): _*) - maxShift
    val newP = (h(98, seed + 1, col("lin")) + 1).cast("double") / 100.0
    df.select(
      factCols.map(col) ++ Seq(
        concat(lit(idPrefix), col("lin")).as("lin"),
        newP.as("p"),
        (col("ts") + off).as("ts"),
        (col("te") + off).as("te")): _*)
  }

  /** The properties reported in paper Table IV. */
  final case class DatasetStats(
      cardinality: Long, timeRange: Long,
      minDuration: Long, maxDuration: Long, avgDuration: Double,
      numFacts: Long, distinctPoints: Long,
      maxTuplesPerPoint: Long, avgTuplesPerPoint: Double)

  /** Compute Table IV's properties with one aggregation + one boundary
    * grouping.
    *
    * "Num. of Tuples (per time point)" follows the paper's accounting:
    * the number of tuples with an interval *boundary* at each distinct
    * point — Table IV's averages are ≈ 2·cardinality/distinctPoints for
    * both real datasets (Meteo: 2·10.2M/545K ≈ 37, Webkit: 2·1.5M/144K ≈ 21).
    */
  def stats(df: DataFrame, factCols: Seq[String]): DatasetStats = {
    val basic = df.agg(
      count(lit(1)).as("card"),
      (max(col("te")) - min(col("ts"))).as("range"),
      min(col("te") - col("ts")).as("minD"),
      max(col("te") - col("ts")).as("maxD"),
      avg(col("te") - col("ts")).as("avgD"),
      countDistinct(col(factCols.head), factCols.tail.map(col): _*).as("facts")).collect()(0)
    val perPoint = df
      .select(explode(array(col("ts"), col("te"))).as("pt"))
      .groupBy("pt").agg(count(lit(1)).as("cnt"))
    val pointStats = perPoint.agg(
      count(lit(1)).as("pts"),
      max(col("cnt")).as("maxC"),
      avg(col("cnt")).as("avgC")).collect()(0)
    DatasetStats(
      basic.getLong(0), basic.getLong(1), basic.getLong(2), basic.getLong(3),
      basic.getDouble(4), basic.getLong(5),
      pointStats.getLong(0), pointStats.getLong(1), pointStats.getDouble(2))
  }
}
