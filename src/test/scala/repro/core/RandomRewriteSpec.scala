package repro.core

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import org.scalatest.funsuite.AnyFunSuite
import repro.TestEnvs

/** Soundness fuzzing (the executable form of Theorem 8.1): random
  * well-typed expressions are rewritten and checked numerically equivalent
  * to the original, under both cost models.
  */
class RandomRewriteSpec extends AnyFunSuite {

  private val meta = Map(
    "A" -> Meta.dense(24, 24), "B" -> Meta.dense(24, 24),
    "C" -> Meta.sparse(24, 24, 60),
  )

  // Square-shape-preserving operators keep every combination well-typed.
  private def matGen(depth: Int): Gen[Expr] =
    if (depth == 0) Gen.oneOf(Mat("A"), Mat("B"), Mat("C"))
    else {
      val sub = matGen(depth - 1)
      Gen.frequency(
        3 -> (for (a <- sub; b <- sub) yield Mul(a, b)),
        3 -> (for (a <- sub; b <- sub) yield Add(a, b)),
        2 -> (for (a <- sub; b <- sub) yield Sub(a, b)),
        2 -> (for (a <- sub; b <- sub) yield Had(a, b)),
        3 -> sub.map(T(_)),
        1 -> sub.map(x => ScaMul(Sca("s1"), x)),
      )
    }

  private val topGen: Gen[Expr] = for {
    m   <- matGen(3)
    top <- Gen.oneOf[Expr => Expr](
             (x: Expr) => x, (x: Expr) => Sum(x), (x: Expr) => Trace(x),
             (x: Expr) => RowSums(x), (x: Expr) => ColSums(x))
  } yield top(m)

  private def samples(n: Int): Seq[Expr] =
    (0 until n).flatMap(k => topGen.apply(Gen.Parameters.default, Seed(k.toLong)))

  for ((e, k) <- samples(40).zipWithIndex) {
    test(f"fuzz #$k%02d (naive): ${e.render.take(60)}") {
      val r   = Rewriter.rewrite(e, meta)
      val env = TestEnvs.localEnv(meta, seed = 3000 + k)
      TestEnvs.assertEquivalent(e, r.best, env, s"fuzz$k")
      assert(r.bestCost <= r.originalCost + 1e-6)
    }
  }

  for ((e, k) <- samples(20).zipWithIndex) {
    test(f"fuzz #$k%02d (mnc): ${e.render.take(60)}") {
      val r   = Rewriter.rewrite(e, meta,
                                 cfg = Rewriter.Config(estimator = () => new MNCEstimator))
      val env = TestEnvs.localEnv(meta, seed = 4000 + k)
      TestEnvs.assertEquivalent(e, r.best, env, s"fuzz$k-mnc")
    }
  }
}
