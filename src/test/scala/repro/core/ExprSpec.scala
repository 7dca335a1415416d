package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** AST basics: rendering, leaves, children, sizes, scalar classification. */
class ExprSpec extends AnyFunSuite {

  private val e = Sum(Mul(T(Mat("M")), Add(Mat("N"), ScaMul(Sca("s"), Mat("M")))))

  test("render is compact and parenthesized") {
    assert(e.render == "sum((t(M) (N+(s.M))))")
    assert(Sub(Mat("A"), Mat("B")).render == "(A-B)")
    assert(Div(Mat("A"), Mat("B")).render == "(A/B)")
    assert(Lit(3.0).render == "3")
    assert(Lit(2.5).render == "2.5")
  }

  test("leaves collects every referenced name") {
    assert(e.leaves == Set("M", "N", "s"))
    assert(Lit(1.0).leaves.isEmpty)
  }

  test("size counts operator nodes only") {
    assert(Mat("M").size == 0)
    assert(e.size == 5)
  }

  test("isScalar marks scalar-valued nodes") {
    assert(Det(Mat("M")).isScalar)
    assert(Trace(Mat("M")).isScalar)
    assert(Sum(Mat("M")).isScalar)
    assert(SAdd(Lit(1), Lit(2)).isScalar)
    assert(SInv(Lit(2)).isScalar)
    assert(!Mul(Mat("A"), Mat("B")).isScalar)
    assert(!RowSums(Mat("A")).isScalar)
  }

  test("children are in syntactic order") {
    assert(Mul(Mat("A"), Mat("B")).children == Seq(Mat("A"), Mat("B")))
    assert(ScaMul(Sca("s"), Mat("A")).children == Seq(Sca("s"), Mat("A")))
    assert(CBind(Mat("A"), Mat("B")).children == Seq(Mat("A"), Mat("B")))
    assert(Cho(Mat("A")).children == Seq(Mat("A")))
  }
}
