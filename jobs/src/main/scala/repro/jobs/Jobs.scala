package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments
import repro.util.Bench

/** spark-submit entrypoints, one per reproduced table/figure.
  *
  * Usage: `spark-submit --class repro.jobs.Fig11 repro.jar [webkit=n1,n2 meteo=n3,n4]`
  * or `sbt "jobs/runMain repro.jobs.Fig11"`. Sizes default to the bench
  * defaults; override per dataset with `name=n1,n2,...` arguments.
  */
object Jobs {

  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def parseSizes(args: Array[String], default: Map[String, Seq[Long]]): Map[String, Seq[Long]] =
    if (args.isEmpty) default
    else args.map { a =>
      val Array(ds, ns) = a.split("=", 2)
      ds -> ns.split(",").map(_.trim.toLong).toSeq
    }.toMap
}

object Table4 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table4")
    val n = if (args.nonEmpty) args(0).toLong else 200_000L
    Bench.table("Table IV -- dataset properties", Experiments.table4Header,
      Experiments.table4(spark, n, n))
    spark.stop()
  }
}

object Fig11 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig11")
    Bench.table("Fig. 11 -- W_UO runtime [ms]", Experiments.fig11Header,
      Experiments.fig11(spark, Jobs.parseSizes(args, Experiments.defaultSizes)))
    spark.stop()
  }
}

object Fig12 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig12")
    Bench.table("Fig. 12 -- negating-window runtime [ms]", Experiments.fig12Header,
      Experiments.fig12(spark, Jobs.parseSizes(args, Experiments.defaultSizes)))
    spark.stop()
  }
}

object Fig13 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig13")
    Bench.table("Fig. 13 -- TP left outer join runtime [ms]", Experiments.fig13Header,
      Experiments.fig13(spark, Jobs.parseSizes(args, Experiments.defaultSizes)))
    spark.stop()
  }
}

object Fig14 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig14")
    val sizes = Jobs.parseSizes(args, Map("webkit" -> Seq(100_000L), "meteo" -> Seq(20_000L)))
    Bench.table("Fig. 14 -- NJ runtime breakdown", Experiments.fig14Header,
      Experiments.fig14(spark, sizes))
    spark.stop()
  }
}

object Fig15 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig15")
    Bench.table("Fig. 15 -- NJ scalability [ms]", Experiments.fig15Header,
      Experiments.fig15(spark, Jobs.parseSizes(args, Experiments.scalabilitySizes)))
    spark.stop()
  }
}
