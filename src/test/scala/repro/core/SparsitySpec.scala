package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** The two sparsity estimators (§7.2): worst-case naive formulas and the
  * structure-exploiting MNC histograms, including a case where MNC's
  * estimate is strictly tighter (the paper: the naive model misses 4
  * efficient rewritings; MNC pays an online-derivation overhead).
  */
class SparsitySpec extends AnyFunSuite {

  test("naive product: worst-case bound min(cells, nnzA·m, nnzB·n)") {
    val a = Meta.sparse(100, 50, 10)
    val b = Meta.sparse(50, 80, 10)
    val c = NaiveEstimator.mul(a, b)
    assert(c.rows == 100 && c.cols == 80)
    assert(c.nnz == math.min(100.0 * 80, math.min(10.0 * 80, 10.0 * 100)))
  }

  test("naive add/hadamard bounds") {
    val a = Meta.sparse(10, 10, 30); val b = Meta.sparse(10, 10, 90)
    assert(NaiveEstimator.add(a, b).nnz == 100)       // capped at cells
    assert(NaiveEstimator.had(a, b).nnz == 30)        // min of the two
  }

  test("transpose/rowSums/colSums/cbind metadata") {
    val a = Meta.sparse(20, 5, 12)
    assert(NaiveEstimator.tr(a).rows == 5 && NaiveEstimator.tr(a).cols == 20)
    assert(NaiveEstimator.rowSums(a) == Meta(20, 1, 12, None))
    assert(NaiveEstimator.colSums(a) == Meta(1, 5, 5, None))
    val c = NaiveEstimator.cbind(a, Meta.dense(20, 3))
    assert(c.cols == 8 && c.nnz == 12 + 60)
  }

  test("inverse and exp are dense; cholesky is triangular") {
    val a = Meta.sparse(10, 10, 5)
    assert(NaiveEstimator.inv(a).nnz == 100)
    assert(NaiveEstimator.exp(a).nnz == 100)
    assert(NaiveEstimator.cho(a).nnz == 55)
  }

  test("MNC exploits single-nnz-per-column structure where naive cannot") {
    // A: 100x100 permutation-like (one nnz per row and column).
    // B: 100x100 with only the first row populated.
    val est = new MNCEstimator
    val a = Meta(100, 100, 100, Some(Hist(Array.fill(100)(1.0), Array.fill(100)(1.0))))
    val hrB = Array.fill(100)(0.0); hrB(0) = 100
    val b = Meta(100, 100, 100, Some(Hist(hrB, Array.fill(100)(1.0))))
    val mnc   = est.mul(a, b)
    val naive = NaiveEstimator.mul(a.copy(hist = None), b.copy(hist = None))
    // Only A's column-0 entries hit B's populated row: true nnz ≈ 100.
    assert(mnc.nnz < naive.nnz / 10,
           s"MNC (${mnc.nnz}) should be much tighter than naive (${naive.nnz})")
  }

  test("MNC derives histograms online and counts the overhead") {
    val est = new MNCEstimator
    val a = Meta.dense(10, 10) // no histogram: derived on demand
    val before = est.derivations
    est.mul(est.prepare(a), est.prepare(a))
    assert(est.derivations > before)
  }

  test("MNC add derives per-row histograms with cell caps") {
    val est = new MNCEstimator
    val h = Some(Hist(Array.fill(4)(3.0), Array.fill(5)(2.4)))
    val a = Meta(4, 5, 12, h)
    val c = est.add(a, a)
    assert(c.nnz <= 20.0 + 1e-9)
    assert(c.hist.get.hr.forall(_ <= 5.0))
  }

  test("MNC falls back to naive formulas above the histogram dimension cap") {
    val est = new MNCEstimator
    val a = Meta.sparse(Meta.MaxHistDim + 1, 10, 50)
    val c = est.mul(a, Meta.dense(10, 3))
    assert(c.nnz == NaiveEstimator.mul(a, Meta.dense(10, 3)).nnz)
  }

  test("scalar and dense helpers") {
    assert(Meta.scalar.isScalar)
    assert(Meta.dense(3, 4).sparsity == 1.0)
    assert(Meta.sparse(3, 4, 100).nnz == 12.0) // capped at cells
  }
}
