package repro.core

import org.scalatest.funsuite.AnyFunSuite
import Constraints.{egd, tgd}

/** Chase mechanics: union-find semantics, functional closure, restricted
  * TGD application, EGD merging, Prune_prov, budgets.
  */
class ChaseSpec extends AnyFunSuite {

  private def inst() = new Instance(NaiveEstimator)

  test("constants intern to stable ids and never merge with other constants") {
    val i = inst()
    val a = i.const("x"); val b = i.const("x"); val c = i.const("y")
    assert(a == b && a != c)
    assert(!i.union(a, c)) // refused
    assert(i.find(a) != i.find(c))
  }

  test("union merges metadata keeping the tighter nnz") {
    val i = inst()
    val a = i.fresh(); val b = i.fresh()
    i.setMeta(a, Meta(10, 10, 80, None))
    i.setMeta(b, Meta(10, 10, 20, None))
    i.union(a, b)
    assert(i.meta(a).get.nnz == 20)
    assert(i.find(a) == i.find(b))
  }

  test("functionalClosure merges same-input constructor results (I_multi_M)") {
    val i = inst()
    val (m, n, r1, r2) = (i.fresh(), i.fresh(), i.fresh(), i.fresh())
    i.addFact("multi_M", Vector(m, n, r1))
    i.addFact("multi_M", Vector(m, n, r2))
    assert(i.functionalClosure())
    assert(i.find(r1) == i.find(r2))
  }

  test("functionalClosure merges classes sharing a name (I_name)") {
    val i = inst()
    val (a, b) = (i.fresh(), i.fresh())
    val n = i.const("M.csv")
    i.addFact("name", Vector(a, n)); i.addFact("name", Vector(b, n))
    i.functionalClosure()
    assert(i.find(a) == i.find(b))
  }

  test("restricted chase does not refire satisfied TGDs (termination)") {
    val i = inst()
    val (m, r) = (i.fresh(), i.fresh())
    i.setMeta(m, Meta.dense(5, 5)); i.setMeta(r, Meta.dense(5, 5))
    i.addFact("tr", Vector(m, r))
    val st = Chase.run(i, Seq(tgd("tr-invol")("tr(M,R)")("tr(R,M)")), maxRounds = 10)
    assert(i.facts("tr").size == 2) // tr(m,r) and tr(r,m), nothing else
    assert(st.rounds <= 3)
  }

  test("EGDs merge through generic premise matching") {
    val i = inst()
    val (i1, i2, m, r) = (i.fresh(), i.fresh(), i.fresh(), i.fresh())
    i.addFact("Identity", Vector(i1))
    i.addFact("multi_M", Vector(i1, m, r))
    Chase.run(i, Seq(egd("id-l")("Identity(I)", "multi_M(I,M,R)")("R=M")))
    assert(i.find(r) == i.find(m))
    assert(i2 >= 0) // silence unused warning
  }

  test("Prune_prov skips steps whose intermediate exceeds the threshold") {
    // (MN)M with associativity: the alternative M(NM) would introduce a huge
    // NM intermediate when N is wide; with a tight threshold it is pruned.
    val i = inst()
    val meta = Map("M" -> Meta.dense(10, 10000), "N" -> Meta.dense(10000, 10))
    val q = Encoder.encode(i, Mul(Mul(Mat("M"), Mat("N")), Mat("M")), meta.get)
    // Original cost: MN = 100 cells + product 100*10000. Threshold below the
    // would-be (N M) intermediate of 10000x10000.
    val st = Chase.run(i, Catalog.all, threshold = 2_000_000)
    assert(st.prunedSteps > 0)
    val best = Extract.extract(i, q).get
    assert(best.expr.render == "((M N) M)") // original stays optimal
  }

  test("fact budget halts growth and reports it") {
    val i = inst()
    val meta = (1 to 6).map(k => s"M$k" -> Meta.dense(50, 50)).toMap
    val chain = meta.keys.toSeq.sorted.map(Mat(_): Expr).reduceLeft(Add(_, _))
    Encoder.encode(i, chain, meta.get)
    val st = Chase.run(i, Catalog.all, maxRounds = 10, maxFacts = 60)
    assert(st.hitFactBudget)
    assert(i.factCount <= 200) // stopped shortly after the budget
  }

  test("deadline halts a long chase and reports it") {
    val i = inst()
    val meta = (1 to 8).map(k => s"M$k" -> Meta.dense(50, 50)).toMap
    val chain = meta.keys.toSeq.sorted.map(Mat(_): Expr).reduceLeft(Mul(_, _))
    Encoder.encode(i, chain, meta.get)
    val st = Chase.run(i, Catalog.all, maxRounds = 50, maxFacts = 5_000_000,
                       deadlineMillis = 50)
    assert(st.hitDeadline || st.rounds < 50)
  }

  test("matches enumerates all homomorphisms including self-joins") {
    val i = inst()
    val (a, b, c) = (i.fresh(), i.fresh(), i.fresh())
    i.addFact("add_M", Vector(a, b, c))
    i.addFact("add_M", Vector(b, a, c))
    val ms = Chase.matches(i, Vector(Constraints.atom("add_M(X,Y,Z)")), Map.empty).toList
    assert(ms.size == 2)
    val joined = Chase.matches(i,
      Vector(Constraints.atom("add_M(X,Y,Z)"), Constraints.atom("add_M(Y,X,Z)")),
      Map.empty).toList
    assert(joined.size == 2)
  }
}
