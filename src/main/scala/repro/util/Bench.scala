package repro.util

/** Minimal wall-clock benchmark harness: warmup + median-of-k runs.
  *
  * Benchmarked thunks must force full execution themselves (e.g. call
  * `df.count()`); the harness measures the thunk end-to-end.
  */
object Bench {

  def timeMs[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    ((a, (System.nanoTime() - t0) / 1e6))
  }

  /** Median runtime in ms over `reps` timed runs after `warmup` discards. */
  def medianMs(reps: Int = 3, warmup: Int = 1)(f: => Unit): Double = {
    (0 until warmup).foreach(_ => f)
    val times = (0 until reps).map(_ => timeMs(f)._2).sorted
    times(times.length / 2)
  }

  /** Render one markdown table row. */
  def row(cells: Any*): String =
    cells.map {
      case d: Double => f"$d%.1f"
      case x         => x.toString
    }.mkString("| ", " | ", " |")

  /** Print a titled markdown table; returns the lines for reuse. */
  def table(title: String, header: Seq[String], rows: Seq[Seq[Any]]): Seq[String] = {
    val lines =
      Seq(s"\n### $title", header.mkString("| ", " | ", " |"),
          header.map(_ => "---").mkString("| ", " | ", " |")) ++
        rows.map(r => row(r: _*))
    lines.foreach(println)
    lines
  }
}
