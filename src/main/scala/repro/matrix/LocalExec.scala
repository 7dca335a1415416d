package repro.matrix

import breeze.linalg.{DenseMatrix, cholesky, det => bdet, inv => binv}
import repro.core._

/** In-memory dense evaluator over Breeze (which ships with Spark).
  *
  * This is the *numeric oracle* for the rewriter: for every pipeline we
  * evaluate the original and the HADAD rewriting on the same random inputs
  * and require element-wise agreement — the executable form of the paper's
  * soundness theorem (§8). It is also the stand-in for the single-node
  * LA libraries (R / NumPy) the paper benchmarks.
  */
object LocalExec {

  sealed trait LVal
  final case class LMat(m: DenseMatrix[Double]) extends LVal
  final case class LSca(v: Double)              extends LVal

  type Env = Map[String, LVal]

  def asMat(v: LVal): DenseMatrix[Double] = v match {
    case LMat(m) => m
    case LSca(s) => DenseMatrix.fill(1, 1)(s)
  }

  def asSca(v: LVal): Double = v match {
    case LSca(s) => s
    case LMat(m) =>
      require(m.rows == 1 && m.cols == 1, s"not a scalar: ${m.rows}x${m.cols}")
      m(0, 0)
  }

  def eval(e: Expr, env: Env): LVal = e match {
    case Mat(n)  => env.getOrElse(n, sys.error(s"unbound matrix '$n'"))
    case Sca(n)  => LSca(asSca(env.getOrElse(n, sys.error(s"unbound scalar '$n'"))))
    case Lit(v)  => LSca(v)
    case Mul(a, b) =>
      (eval(a, env), eval(b, env)) match {
        // 1x1 results of scalar-yielding subexpressions multiply as scalars.
        case (LSca(x), LSca(y)) => LSca(x * y)
        case (LSca(x), LMat(m)) => LMat(m * x)
        case (LMat(m), LSca(x)) => LMat(m * x)
        case (LMat(x), LMat(y)) => LMat(x * y)
      }
    case Add(a, b)    => zip(a, b, env)(_ + _, _ + _)
    case Sub(a, b)    => zip(a, b, env)(_ - _, _ - _)
    case Had(a, b)    => zip(a, b, env)((x, y) => x *:* y, _ * _)
    case Div(a, b)    => zip(a, b, env)((x, y) => x /:/ y, _ / _)
    case ScaMul(s, m) => LMat(asMat(eval(m, env)) * asSca(eval(s, env)))
    case T(m)         => LMat(asMat(eval(m, env)).t.copy)
    case Inv(m)       => eval(m, env) match {
      case LSca(x) => LSca(1.0 / x)
      case LMat(x) => LMat(binv(x))
    }
    case Exp(m)       => LMat(breeze.numerics.exp(asMat(eval(m, env))))
    case Diag(m)      =>
      val x = asMat(eval(m, env)); val k = math.min(x.rows, x.cols)
      LMat(DenseMatrix.tabulate(k, 1)((i, _) => x(i, i)))
    case RowSums(m)   =>
      val x = asMat(eval(m, env))
      LMat(DenseMatrix.tabulate(x.rows, 1)((i, _) => (0 until x.cols).map(x(i, _)).sum))
    case ColSums(m)   =>
      val x = asMat(eval(m, env))
      LMat(DenseMatrix.tabulate(1, x.cols)((_, j) => (0 until x.rows).map(x(_, j)).sum))
    case CBind(a, b)  =>
      val (x, y) = (asMat(eval(a, env)), asMat(eval(b, env)))
      LMat(DenseMatrix.horzcat(x, y))
    case Cho(m)       => LMat(cholesky(asMat(eval(m, env))))
    case Det(m)       => LSca(bdet(asMat(eval(m, env))))
    case Trace(m)     =>
      val x = asMat(eval(m, env))
      LSca((0 until math.min(x.rows, x.cols)).map(i => x(i, i)).sum)
    case Sum(m)       => eval(m, env) match {
      case LSca(x) => LSca(x)
      case LMat(x) => LSca(breeze.linalg.sum(x))
    }
    case SAdd(a, b)   => LSca(asSca(eval(a, env)) + asSca(eval(b, env)))
    case SMul(a, b)   => LSca(asSca(eval(a, env)) * asSca(eval(b, env)))
    case SInv(a)      => LSca(1.0 / asSca(eval(a, env)))
  }

  private def zip(a: Expr, b: Expr, env: Env)(
      fm: (DenseMatrix[Double], DenseMatrix[Double]) => DenseMatrix[Double],
      fs: (Double, Double) => Double): LVal =
    (eval(a, env), eval(b, env)) match {
      case (LSca(x), LSca(y)) => LSca(fs(x, y))
      case (x, y)             => LMat(fm(asMat(x), asMat(y)))
    }

  /** Max |x-y| over all cells / the scalar pair, for equivalence asserts. */
  def maxDiff(x: LVal, y: LVal): Double = (x, y) match {
    case (LSca(a), LSca(b)) => math.abs(a - b)
    case _ =>
      val (a, b) = (asMat(x), asMat(y))
      require(a.rows == b.rows && a.cols == b.cols,
              s"shape mismatch ${a.rows}x${a.cols} vs ${b.rows}x${b.cols}")
      breeze.linalg.max(breeze.numerics.abs(a - b))
  }

  /** Deterministic random dense matrix. */
  def rand(rows: Int, cols: Int, seed: Long, scale: Double = 1.0): DenseMatrix[Double] = {
    val r = new scala.util.Random(seed)
    DenseMatrix.fill(rows, cols)((r.nextDouble() + 0.1) * scale)
  }

  /** Deterministic random sparse matrix with approx `sparsity` density. */
  def randSparse(rows: Int, cols: Int, sparsity: Double, seed: Long): DenseMatrix[Double] = {
    val r = new scala.util.Random(seed)
    DenseMatrix.fill(rows, cols)(if (r.nextDouble() < sparsity) r.nextDouble() + 0.1 else 0.0)
  }

  /** Symmetric positive-definite random matrix (safe to invert / cholesky).
    * Normalized so eigenvalues stay O(1)-ish and determinants of the sizes
    * used in benches remain finite in double precision.
    */
  def randSPD(n: Int, seed: Long): DenseMatrix[Double] = {
    val b = rand(n, n, seed)
    b * b.t / n.toDouble + DenseMatrix.eye[Double](n)
  }
}
