package repro.core

import org.scalatest.funsuite.AnyFunSuite
import Constraints.{atom, egd, tgd}

/** The constraint DSL: parsing, arity checks, variable classification. */
class ConstraintsSpec extends AnyFunSuite {

  test("atom parses variables and constants") {
    val a = atom("""name(M, "M.csv")""")
    assert(a.rel == "name")
    assert(a.args == Vector("M", "\"M.csv\""))
    assert(a.vars == Set("M"))
  }

  test("atom rejects unknown relations") {
    val e = intercept[RuntimeException](atom("frobnicate(M,N)"))
    assert(e.getMessage.contains("unknown VREM relation"))
  }

  test("atom rejects wrong arity") {
    val e = intercept[IllegalArgumentException](atom("multi_M(M,N)"))
    assert(e.getMessage.contains("expects 3 args"))
  }

  test("constants may contain commas inside quotes") {
    val a = atom("""type(M, "a,b")""")
    assert(a.args(1) == "\"a,b\"")
  }

  test("TGD existentials are conclusion-only variables") {
    val t = tgd("t")("multi_M(M,N,R1)", "tr(R1,R2)")("tr(M,R3)", "tr(N,R4)",
                                                     "multi_M(R4,R3,R2)")
    assert(t.existentials == Set("R3", "R4"))
    assert(t.premiseVars == Set("M", "N", "R1", "R2"))
  }

  test("EGD requires both equated variables in the premise") {
    intercept[IllegalArgumentException] {
      egd("bad")("name(M,n)")("M=Z")
    }
    val ok = egd("ok")("name(M,n)", "name(N,n)")("M=N")
    assert(ok.left == "M" && ok.right == "N")
  }

  test("noPrune marks a TGD as definitional") {
    val t = tgd("t")("type(M,\"S\")")("cho(M,L)")
    assert(t.pruneable)
    assert(!t.noPrune.pruneable)
  }

  test("the full catalog parses and is well-formed") {
    val all = Catalog.all ++ Catalog.qrlu
    assert(all.size > 70)
    all.foreach {
      case t: TGD => assert(t.premise.nonEmpty && t.conclusion.nonEmpty, t.name)
      case e: EGD => assert(e.premise.nonEmpty, e.name)
    }
    // Names are unique (byName lookups stay unambiguous).
    val names = Catalog.all.map(_.name)
    assert(names.distinct.size == names.size)
  }

  test("byName finds catalog constraints") {
    assert(Catalog.byName("mul-assoc-1").isInstanceOf[TGD])
    intercept[RuntimeException](Catalog.byName("nope"))
  }
}
