package repro.core

import org.apache.spark.sql.{Column, DataFrame, Dataset}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** The TP join ops with negation treated by the paper (Tables I & III). */
sealed trait TPJoinOp
object TPJoinOp {
  /** `r ▷Tp s` — anti join: WU(r;s) ∪ WN(r;s). */
  case object Anti extends TPJoinOp
  /** `r ⟕Tp s` — left outer join: WU(r;s) ∪ WN(r;s) ∪ WO. */
  case object LeftOuter extends TPJoinOp
  /** `r ⟖Tp s` — right outer join: WO ∪ WU(s;r) ∪ WN(s;r). */
  case object RightOuter extends TPJoinOp
  /** `r ⟗Tp s` — full outer join: all five window sets. */
  case object FullOuter extends TPJoinOp
}

/** A finalized output tuple before fact unpacking.
  *
  * `rfJson`/`sfJson` are the fact structs of the user-facing left/right
  * input, packed as JSON (None where the paper writes `-`/null facts).
  */
final case class OutRow(
    rfJson: Option[String], sfJson: Option[String],
    lin: String, p: Double, ts: Long, te: Long)

/** NJ — the paper's NegationJoins operator (Alg. 3) on Spark DataFrames.
  *
  * Input TP relations are DataFrames with arbitrary fact columns plus the
  * four TP meta columns `lin` (lineage string, for base relations the unique
  * tuple identifier), `p` (probability), `ts`, `te` (half-open interval).
  *
  * Plan shape, mirroring paper Fig. 10a:
  *
  *  1. `winit` — ONE conventional Catalyst left outer join
  *     `r ⟕_{θ ∧ θo} s` with `θo : r.ts < s.te ∧ s.ts < r.te`
  *     (the CLJ node; Catalyst picks the physical join, as PostgreSQL's
  *     optimizer does in the paper).
  *  2. `groupByKey` on the generating `r` tuple + `flatMapGroups` running
  *     the LAWA-U and LAWA-N sweeps of [[GroupWindows]] partition-locally —
  *     the W_uo and W_n nodes. No tuple replication, no further interval
  *     joins, no duplicate-eliminating union.
  *  3. A lineage-based filter + per-window-set lineage concatenation turns
  *     windows into output tuples (`λr`, `λr∧λs`, `λr∧¬λs`).
  *
  * θ is supplied as `(rAlias, sAlias) => Column`, where the two arguments
  * are the SQL aliases under which the original left (`r`) and right (`s`)
  * relations' columns are reachable — e.g.
  * `(a, b) => col(s"$a.loc") === col(s"$b.loc")`. The operator itself decides
  * which side is the outer of each pass (full/right outer joins run a second,
  * sides-swapped pass, exactly as Alg. 3 re-invokes NegationJoins).
  *
  * Output probabilities are exact under the model's base-tuple independence:
  * `P(λr∧λs)=pr·ps` and `P(λr∧¬∨λsᵢ)=pr·Π(1−psᵢ)` (cross-checked in tests
  * against [[Lineage.prob]]'s exact valuation).
  */
object NegationJoin {

  /** The reserved TP meta columns; everything else is a fact attribute. */
  val MetaCols: Seq[String] = Seq("lin", "p", "ts", "te")

  def factCols(df: DataFrame): Seq[String] =
    df.columns.toSeq.filterNot(MetaCols.contains)

  /** Equality θ on identically-named fact columns of both inputs. */
  def thetaEq(cols: String*): (String, String) => Column =
    (l, r) => cols.map(c => col(s"$l.$c") === col(s"$r.$c")).reduce(_ && _)

  /** Step 1: the conventional left outer join `winit` (paper §VI-A, Fig. 5).
    *
    * `swap=true` runs the pass with `s` as the outer relation (for the
    * second NegationJoins invocation of Alg. 3); θ argument order is fixed
    * to (original left alias, original right alias) either way.
    */
  def winitRows(r: DataFrame, s: DataFrame, theta: (String, String) => Column,
                swap: Boolean = false): Dataset[XRow] = {
    val (outer, inner) = if (swap) (s, r) else (r, s)
    val spark = outer.sparkSession
    import spark.implicits._
    val of = factCols(outer)
    val inf = factCols(inner)
    val lhs = outer.as("_l")
    val rhs = inner.as("_r")
    val thetaCol = if (swap) theta("_r", "_l") else theta("_l", "_r")
    val overlap = col("_l.ts") < col("_r.te") && col("_r.ts") < col("_l.te")
    val matched = col("_r.lin").isNotNull
    lhs.join(rhs, thetaCol && overlap, "left_outer").select(
      to_json(struct(of.map(c => col(s"_l.$c").as(c)): _*)).as("fr"),
      col("_l.lin").as("lr"),
      col("_l.p").as("pr"),
      col("_l.ts").as("rts"),
      col("_l.te").as("rte"),
      when(matched, to_json(struct(inf.map(c => col(s"_r.$c").as(c)): _*))).as("fs"),
      col("_r.lin").as("ls"),
      col("_r.p").as("ps"),
      when(matched, greatest(col("_l.ts"), col("_r.ts"))).cast(LongType).as("os"),
      when(matched, least(col("_l.te"), col("_r.te"))).cast(LongType).as("oe"),
    ).as[XRow]
  }

  /** Which window kinds to emit from a sweep pass. */
  object Mode { val UO = "UO"; val N = "N"; val All = "ALL" }

  /** Step 2: group winit by generating outer tuple and sweep (LAWA-U/N). */
  def windowsFrom(x: Dataset[XRow], mode: String): Dataset[Win] = {
    val spark = x.sparkSession
    import spark.implicits._
    x.groupByKey(row => (row.fr, row.lr, row.rts, row.rte))
      .flatMapGroups { (key, it) =>
        val (fr, lr, rts, rte) = key
        val rows = it.toVector
        val pr = rows.head.pr
        val ms = GroupWindows.toMatches(rows)
        mode match {
          case Mode.UO  => GroupWindows.uo(fr, lr, pr, rts, rte, ms).iterator
          case Mode.N   => GroupWindows.negating(fr, lr, pr, ms).iterator
          case Mode.All => GroupWindows.all(fr, lr, pr, rts, rte, ms).iterator
        }
      }
  }

  /** Unmatched + overlapping windows of `r` w.r.t. `s` (bench node W_uo). */
  def windowsUO(r: DataFrame, s: DataFrame, theta: (String, String) => Column): Dataset[Win] =
    windowsFrom(winitRows(r, s, theta), Mode.UO)

  /** All three window sets of `r` w.r.t. `s` (bench node W_n incl. W_uo). */
  def windowsAll(r: DataFrame, s: DataFrame, theta: (String, String) => Column): Dataset[Win] =
    windowsFrom(winitRows(r, s, theta), Mode.All)

  // ------------------------------------------------------------- finalize

  /** Step 3: lineage concatenation per window set (paper §V, Alg. 3 l.10-17).
    *
    * `windowSideIsLeft` states whether the window pass used the user-facing
    * left table as its outer relation; it decides on which side of the
    * output the window's facts land and the ∧-operand order of λ.
    */
  def windowToOut(w: Win, windowSideIsLeft: Boolean): OutRow = {
    val (lin, p) = w.kind match {
      case "U" => (w.lr, w.pr)
      case "O" =>
        val l = Lineage.andL(Lineage.parse(w.lr), Lineage.parse(w.lsLins.head))
        (l.render, w.pr * w.lsProbs.head)
      case "N" =>
        val neg = Lineage.or(w.lsLins.map(Lineage.parse))
        val l = Lineage.andNot(Lineage.parse(w.lr), neg)
        (l.render, w.pr * w.lsProbs.map(1.0 - _).product)
    }
    if (windowSideIsLeft) OutRow(Some(w.fr), w.fs, lin, p, w.ts, w.te)
    else OutRow(w.fs, Some(w.fr), lin, p, w.ts, w.te)
  }

  /** Unpack OutRows into the user-facing schema.
    *
    * Left fact columns keep their names; right fact columns are prefixed
    * with `s_` when they would clash with a left fact column or a meta
    * column. Anti joins emit no right fact columns (paper: "Fr is the only
    * fact included").
    */
  def unpack(out: Dataset[OutRow], r: DataFrame, s: DataFrame, anti: Boolean): DataFrame = {
    val rf = factCols(r)
    val sf = factCols(s)
    val rSchema = r.select(rf.map(col): _*).schema
    val sSchema = s.select(sf.map(col): _*).schema
    def sName(c: String) = if (rf.contains(c) || MetaCols.contains(c)) s"s_$c" else c
    val withStructs = out.toDF()
      .withColumn("_rf", from_json(col("rfJson"), rSchema))
      .withColumn("_sf", from_json(col("sfJson"), sSchema))
    val cols =
      rf.map(c => col(s"_rf.$c").as(c)) ++
        (if (anti) Nil else sf.map(c => col(s"_sf.$c").as(sName(c)))) ++
        Seq(col("lin"), col("p"), col("ts"), col("te"))
    withStructs.select(cols: _*)
  }

  // ------------------------------------------------------------- joins

  /** NegationJoins(r, s, θ, op) — paper Alg. 3. */
  def apply(r: DataFrame, s: DataFrame, theta: (String, String) => Column,
            op: TPJoinOp): DataFrame = {
    val spark = r.sparkSession
    import spark.implicits._
    def pass(swap: Boolean, keep: Win => Boolean): Dataset[OutRow] =
      windowsFrom(winitRows(r, s, theta, swap), Mode.All)
        .filter(keep)
        .map(w => windowToOut(w, windowSideIsLeft = !swap))
    op match {
      case TPJoinOp.Anti =>
        unpack(pass(swap = false, _.kind != "O"), r, s, anti = true)
      case TPJoinOp.LeftOuter =>
        unpack(pass(swap = false, _ => true), r, s, anti = false)
      case TPJoinOp.RightOuter =>
        // WO from the (r;s) pass, WU/WN from the swapped pass (Table III).
        val o = pass(swap = false, _.kind == "O")
        val un = pass(swap = true, _.kind != "O")
        unpack(o.union(un), r, s, anti = false)
      case TPJoinOp.FullOuter =>
        // Alg. 3 line 18: the left-outer pass plus NegationJoins(s, r, θ, ▷).
        val left = pass(swap = false, _ => true)
        val un = pass(swap = true, _.kind != "O")
        unpack(left.union(un), r, s, anti = false)
    }
  }
}
