package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.util.Bench

/** Benchmark suites reproducing the paper's evaluation (§VII), one suite
  * per reported table/figure. Each suite prints a markdown table with the
  * measured numbers; correctness (NJ ≡ TA result cardinalities) is asserted
  * inside the experiment functions. Paper-vs-measured numbers are recorded
  * in EXPERIMENTS.md.
  *
  * Sizes are scaled to CI hardware (see `Experiments.defaultSizes`); the
  * paper used 20K–200K (figs 11–13) and up to 2M (fig 15) tuples.
  */
class Table4DatasetProperties extends SparkSpec {
  test("Table IV -- dataset properties (synthetic substitutes)") {
    val rows = Experiments.table4(spark, nWebkit = 200_000, nMeteo = 200_000)
    Bench.table("Table IV -- dataset properties", Experiments.table4Header, rows)
    assert(rows.size == 2)
  }
}

class Fig11WuoBench extends SparkSpec {
  test("Fig. 11 -- W_UO (unmatched+overlapping windows): NJ vs TA") {
    val rows = Experiments.fig11(spark, Experiments.defaultSizes)
    Bench.table("Fig. 11 -- W_UO runtime [ms]", Experiments.fig11Header, rows)
    assert(rows.nonEmpty)
  }
}

class Fig12NegatingBench extends SparkSpec {
  test("Fig. 12 -- negating windows: NJ-WN, NJ-WUON vs TA") {
    val rows = Experiments.fig12(spark, Experiments.defaultSizes)
    Bench.table("Fig. 12 -- negating-window runtime [ms]", Experiments.fig12Header, rows)
    assert(rows.nonEmpty)
  }
}

class Fig13LeftJoinBench extends SparkSpec {
  test("Fig. 13 -- TP left outer join: NJ vs TA") {
    val rows = Experiments.fig13(spark, Experiments.defaultSizes)
    Bench.table("Fig. 13 -- TP left outer join runtime [ms]", Experiments.fig13Header, rows)
    assert(rows.nonEmpty)
  }
}

class Fig14BreakdownBench extends SparkSpec {
  test("Fig. 14 -- NJ runtime breakdown (CLJ / W_UO / W_N)") {
    val sizes = Map("webkit" -> Seq(100_000L), "meteo" -> Seq(20_000L))
    val rows = Experiments.fig14(spark, sizes)
    Bench.table("Fig. 14 -- NJ runtime breakdown", Experiments.fig14Header, rows)
    assert(rows.nonEmpty)
  }
}

class Fig15ScalabilityBench extends SparkSpec {
  test("Fig. 15 -- NJ left outer join scalability") {
    val rows = Experiments.fig15(spark, Experiments.scalabilitySizes)
    Bench.table("Fig. 15 -- NJ scalability [ms]", Experiments.fig15Header, rows)
    assert(rows.nonEmpty)
  }
}
