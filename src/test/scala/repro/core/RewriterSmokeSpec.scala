package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Early end-to-end checks of encode → chase → extract → decode on the
  * paper's flagship examples (§2, §7.2, Example 6.2).
  */
class RewriterSmokeSpec extends AnyFunSuite {

  private val meta = Map(
    "M" -> Meta.dense(5000, 100),
    "N" -> Meta.dense(100, 5000),
    "D" -> Meta.dense(400, 400),
    "C" -> Meta.dense(400, 400),
    "A" -> Meta.sparse(10000, 100, 800),
    "B" -> Meta.dense(10000, 100),
    "v" -> Meta.dense(100, 1),
  )

  private def rw(e: Expr, views: Seq[Rewriter.View] = Nil,
                 cfg: Rewriter.Config = Rewriter.Config()): Rewriter.Result =
    Rewriter.rewrite(e, meta, views, cfg)

  test("P1.15 chain order: (MN)M becomes M(NM)") {
    val r = rw(Mul(Mul(Mat("M"), Mat("N")), Mat("M")))
    assert(r.best.render == "(M (N M))", r.best.render)
    assert(r.bestCost < r.originalCost)
  }

  test("P1.1 transpose pushdown: (MN)^T becomes t(N) t(M)") {
    val r = rw(T(Mul(Mat("M"), Mat("N"))))
    assert(r.best.render == "(t(N) t(M))", r.best.render)
    assert(r.bestCost < r.originalCost)
  }

  test("P1.5 inverse involution: inv(inv(D)) becomes D") {
    val r = rw(Inv(Inv(Mat("D"))))
    assert(r.best.render == "D", r.best.render)
  }

  test("P1.13 sum of product avoids the product") {
    val r = rw(Sum(Mul(Mat("M"), Mat("N"))))
    assert(r.best.render == "sum((t(colSums(M))*rowSums(N)))", r.best.render)
    assert(r.bestCost < r.originalCost / 1000)
  }

  test("P1.3 inverse fusion: inv(C) inv(D) becomes inv(DC)") {
    val r = rw(Mul(Inv(Mat("C")), Inv(Mat("D"))))
    assert(r.best.render == "inv((D C))", r.best.render)
  }

  test("view reuse: V = NM lets (MN)M be answered as M V") {
    val r = rw(Mul(Mul(Mat("M"), Mat("N")), Mat("M")),
               views = Seq(Rewriter.View("V3", Mul(Mat("N"), Mat("M")))))
    assert(r.best.render == "(M V3)", r.best.render)
  }

  test("OLS with inverse view (paper §2): (XᵀX)⁻¹(Xᵀy) uses V = X⁻¹") {
    val m  = meta + ("X" -> Meta.dense(800, 800)) + ("y" -> Meta.dense(800, 1))
    val e  = Mul(Inv(Mul(T(Mat("X")), Mat("X"))), Mul(T(Mat("X")), Mat("y")))
    val r  = Rewriter.rewrite(e, m, Seq(Rewriter.View("V1", Inv(Mat("X")))))
    // Expect the inverse to disappear in favor of V1/t(V1).
    assert(!r.best.render.contains("inv("), r.best.render)
    assert(r.best.render.contains("V1"), r.best.render)
    assert(r.bestCost < r.originalCost)
  }

  test("Example 6.2: V = N + cho(M)·t(cho(M)) answers M + N") {
    val m = Map("M" -> Meta.dense(300, 300), "N" -> Meta.dense(300, 300))
    val body = Add(Mat("N"), Mul(Cho(Mat("M")), T(Cho(Mat("M")))))
    val r = Rewriter.rewrite(Add(Mat("M"), Mat("N")), m,
      Seq(Rewriter.View("V", body)),
      Rewriter.Config(types = Map("M" -> "S")))
    assert(r.best.render == "V", r.best.render)
  }
}
