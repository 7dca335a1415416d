package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.core.Rewriter.View
import repro.matrix.{Exec, Gen, Ops}

/** Shared benchmark machinery: builds Spark environments from metadata,
  * runs a pipeline's original and HADAD-rewritten forms on the as-stated
  * executor, sanity-checks the two results against each other, and prints
  * paper-style table rows. Every bench reports a deterministic metric
  * (total materialized cells — the quantity HADAD's cost model predicts)
  * next to wall time.
  */
object Harness {

  final case class Row(table: String, pipeline: String,
                       rewrite: String,
                       origCells: Long, rwCells: Long,
                       origMs: Double, rwMs: Double, rwFindMs: Double) {
    def cellSpeedup: Double = if (rwCells == 0) Double.PositiveInfinity
                              else origCells.toDouble / rwCells
    def wallSpeedup: Double = if (rwMs == 0) Double.PositiveInfinity else origMs / rwMs
    def overheadPct: Double = 100.0 * rwFindMs / (origMs + rwFindMs)
  }

  val header: String =
    f"${"pipeline"}%-8s ${"orig cells"}%12s ${"rw cells"}%12s ${"cellx"}%8s " +
    f"${"orig ms"}%9s ${"rw ms"}%9s ${"wallx"}%7s ${"find ms"}%8s  rewrite"

  def fmt(r: Row): String =
    f"${r.pipeline}%-8s ${r.origCells}%12d ${r.rwCells}%12d ${r.cellSpeedup}%8.1f " +
    f"${r.origMs}%9.0f ${r.rwMs}%9.0f ${r.wallSpeedup}%7.1f ${r.rwFindMs}%8.0f  ${r.rewrite}"

  def printTable(title: String, rows: Seq[Row]): Unit = {
    println(s"\n== $title ==")
    println(header)
    rows.foreach(r => println(fmt(r)))
  }

  /** Build a Spark COO environment matching `meta` profiles. Square matrices
    * listed in `spd` are generated symmetric positive definite (so that
    * inverse/determinant/Cholesky pipelines are well-posed); matrices with
    * sparsity < 0.5 are generated sparse with that nnz.
    */
  def envFromMeta(spark: SparkSession, meta: Map[String, Meta],
                  spd: Set[String] = Set("C", "D"), seed: Long = 1234,
                  scalars: Map[String, Double] = Map("s1" -> 1.7, "s2" -> 2.3)): Exec.Env = {
    val mats: Exec.Env = meta.map { case (n, m) =>
      val v =
        if (spd(n) && m.rows == m.cols && m.rows <= 2000)
          Gen.spd(spark, m.rows.toInt, seed + n.hashCode)
        else if (m.sparsity < 0.5)
          Gen.sparse(spark, m.rows, m.cols, m.nnz.toLong, seed + n.hashCode)
        else Gen.dense(spark, m.rows, m.cols, seed + n.hashCode)
      n -> (Exec.MatV(v): Exec.EVal)
    }
    mats ++ scalars.map { case (n, v) => n -> (Exec.ScaV(v): Exec.EVal) }
  }

  /** Materialize views into the environment (computed once, like the paper's
    * pre-computed CSV views) and return the extended env + view metadata.
    */
  def withViews(env: Exec.Env, views: Seq[View], meta: Map[String, Meta],
                est: Estimator = NaiveEstimator): (Exec.Env, Map[String, Meta]) = {
    var e = env
    var m = meta
    for (v <- views) {
      val value = Exec.run(v.body, e).value
      val vm    = CostModel.gamma(v.body, m.get, est).meta
      e += (v.name -> value)
      m += (v.name -> vm)
    }
    (e, m)
  }

  /** Rough agreement check between the two executions (sum of all cells). */
  private def sanity(id: String, a: Exec.Result, b: Exec.Result): Unit = {
    val (x, y) = (summary(a), summary(b))
    if (x.isNaN || x.isInfinite)
      require(y.isNaN || y.isInfinite || math.abs(y) > 1e100,
              s"$id: original overflowed but rewrite did not: $x vs $y")
    else {
      val scale = math.max(1.0, math.abs(x))
      require(math.abs(x - y) / scale < 1e-6,
              s"$id: original and rewrite disagree: $x vs $y")
    }
  }

  private def summary(r: Exec.Result): Double = r.value match {
    case Exec.ScaV(v) => v
    case Exec.MatV(m) => Ops.sumAll(m)
  }

  /** Run one pipeline: HADAD rewrite, then both forms on the executor. */
  def run(table: String, id: String, e: Expr, meta: Map[String, Meta],
          env: Exec.Env, views: Seq[View] = Nil,
          estimator: () => Estimator = () => NaiveEstimator,
          explicitRewrite: Option[Expr] = None): Row = {
    val r = Rewriter.rewrite(e, meta, views, Rewriter.Config(estimator = estimator))
    val chosen = explicitRewrite.getOrElse(r.chosen)
    val orig = Exec.run(e, env)
    val rw   = Exec.run(chosen, env)
    sanity(id, orig, rw)
    Row(table, id, chosen.render, orig.totalCells, rw.totalCells,
        orig.wallMillis, rw.wallMillis, r.findMillis)
  }

  /** Markdown-ish dump appended by jobs for EXPERIMENTS.md bookkeeping. */
  def toMarkdown(title: String, rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb.append(s"### $title\n\n")
    sb.append("| pipeline | orig cells | rw cells | cell speedup | orig ms | rw ms | wall speedup | RW_find ms | rewrite |\n")
    sb.append("|---|---|---|---|---|---|---|---|---|\n")
    rows.foreach { r =>
      sb.append(f"| ${r.pipeline} | ${r.origCells} | ${r.rwCells} | ${r.cellSpeedup}%.1f× " +
                f"| ${r.origMs}%.0f | ${r.rwMs}%.0f | ${r.wallSpeedup}%.1f× | ${r.rwFindMs}%.0f | `${r.rewrite}` |\n")
    }
    sb.toString
  }

}
