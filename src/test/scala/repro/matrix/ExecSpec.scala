package repro.matrix

import repro.SparkSpec
import repro.core._
import repro.matrix.Exec.{EVal, MatV, ScaV}

/** The distributed as-stated executor agrees with the local dense executor
  * on whole pipelines, and its materialization stats reflect intermediate
  * sizes (the quantity HADAD optimizes).
  */
class ExecSpec extends SparkSpec {

  private lazy val envB: Map[String, breeze.linalg.DenseMatrix[Double]] = Map(
    "M" -> LocalExec.rand(24, 6, 1),
    "N" -> LocalExec.rand(6, 24, 2),
    "C" -> LocalExec.randSPD(8, 3),
    "D" -> LocalExec.randSPD(8, 4),
    "v" -> LocalExec.rand(6, 1, 5),
  )
  private lazy val envSpark: Exec.Env =
    envB.map { case (n, m) => n -> (MatV(COOMatrix.fromBreeze(spark, m)): EVal) }
  private lazy val envLocal: LocalExec.Env =
    envB.map { case (n, m) => n -> (LocalExec.LMat(m): LocalExec.LVal) }

  private def check(e: Expr, tol: Double = 1e-8): Unit = {
    val got = Exec.run(e, envSpark).value
    val exp = LocalExec.eval(e, envLocal)
    val d = (got, exp) match {
      case (ScaV(x), LocalExec.LSca(y)) => math.abs(x - y)
      case (MatV(m), lv)                =>
        breeze.linalg.max(breeze.numerics.abs(m.toBreeze() - LocalExec.asMat(lv)))
      case other                        => fail(s"value kind mismatch: $other")
    }
    assert(d < tol, s"${e.render}: diff $d")
  }

  test("(MN)M as stated")         { check(Mul(Mul(Mat("M"), Mat("N")), Mat("M"))) }
  test("M(NM) rewritten order")   { check(Mul(Mat("M"), Mul(Mat("N"), Mat("M")))) }
  test("sum(MN)")                 { check(Sum(Mul(Mat("M"), Mat("N")))) }
  test("sum(t(colSums(M))*rowSums(N))") {
    check(Sum(Had(T(ColSums(Mat("M"))), RowSums(Mat("N")))))
  }
  test("inv(C) inv(D) vs inv(DC)") {
    check(Mul(Inv(Mat("C")), Inv(Mat("D"))), tol = 1e-6)
    check(Inv(Mul(Mat("D"), Mat("C"))), tol = 1e-6)
  }
  test("trace and det pipelines") {
    check(SAdd(Trace(Inv(Mul(Mat("C"), Mat("D")))), Trace(Mat("D"))), tol = 1e-6)
    check(SMul(Det(Mat("C")), Det(Mat("D"))), tol = 1e-3)
  }
  test("(A+B)v vs Av+Bv") {
    val e1 = Mul(Add(Mat("M"), Mat("M")), Mat("v"))
    val e2 = Add(Mul(Mat("M"), Mat("v")), Mul(Mat("M"), Mat("v")))
    check(e1); check(e2)
  }

  test("materialization stats grow with intermediate size") {
    val asStated = Exec.run(Mul(Mul(Mat("M"), Mat("N")), Mat("M")), envSpark)
    val rewritten = Exec.run(Mul(Mat("M"), Mul(Mat("N"), Mat("M"))), envSpark)
    // (MN) is 24x24=576 cells; (NM) is 6x6=36 — the rewrite materializes less.
    assert(asStated.totalCells > rewritten.totalCells,
           s"${asStated.totalCells} vs ${rewritten.totalCells}")
  }

  test("scalar results surface through Result.scalar") {
    val r = Exec.run(Sum(Mat("M")), envSpark)
    assert(math.abs(r.scalar - breeze.linalg.sum(envB("M"))) < 1e-8)
  }
}
