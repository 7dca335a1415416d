package repro

import repro.core._
import repro.matrix.LocalExec
import repro.matrix.LocalExec.{Env, LMat, LSca, LVal}

/** Small deterministic environments for numeric-equivalence tests.
  *
  * The rewriter runs at *bench-scale* metadata (cost decisions depend on
  * dims), but equivalence of original vs rewriting holds at any consistent
  * shapes — so numerics run on shrunken matrices: every distinct dimension d
  * maps to max(2, d/50) (1 stays 1). Square matrices that may be inverted
  * are generated symmetric positive definite; all entries are positive so
  * element-wise division is well-defined.
  */
object TestEnvs {

  def smallDim(d: Long): Int = if (d <= 1) 1 else math.max(2, (d / 50).toInt)

  /** Build a local env for all names in `metaMap`. */
  def localEnv(metaMap: Map[String, Meta], seed: Long,
               spd: Set[String] = Set("C", "D"),
               scalars: Map[String, Double] = Map("s1" -> 1.7, "s2" -> 2.3)): Env = {
    val mats: Env = metaMap.map { case (n, m) =>
      val (r, c) = (smallDim(m.rows), smallDim(m.cols))
      val value =
        if (spd(n) && r == c) LocalExec.randSPD(r, seed + n.hashCode)
        else if (m.sparsity < 0.5) LocalExec.randSparse(r, c, 0.4, seed + n.hashCode)
        else LocalExec.rand(r, c, seed + n.hashCode)
      n -> LMat(value)
    }
    mats ++ scalars.map { case (n, v) => n -> (LSca(v): LVal) }
  }

  /** Extend an env with materialized views (computed from their bodies). */
  def withViews(env: Env, views: Seq[Rewriter.View]): Env =
    views.foldLeft(env)((e, v) => e + (v.name -> LocalExec.eval(v.body, e)))

  /** Relative max-difference equivalence check. */
  def assertEquivalent(a: Expr, b: Expr, env: Env, label: String,
                       tol: Double = 1e-6): Unit = {
    val (va, vb) = (LocalExec.eval(a, env), LocalExec.eval(b, env))
    val scale = va match {
      case LSca(x) => math.max(1.0, math.abs(x))
      case LMat(m) => math.max(1.0, breeze.linalg.max(breeze.numerics.abs(m)))
    }
    val d = LocalExec.maxDiff(va, vb)
    assert(d / scale < tol,
           s"$label: '${a.render}' vs '${b.render}' differ by $d (scale $scale)")
  }
}
