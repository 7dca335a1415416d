package repro.hybrid

import repro.core._
import repro.core.Rewriter.View

/** The hybrid micro-benchmark queries Q1–Q10 (paper §9.2.2): the LA parts
  * are Table 7's P3.1–P3.10 over the RA-built matrices M (dense, nT x 12)
  * and N (ultra-sparse, nT x h), plus per-query synthetic extras. For each
  * query this catalog fixes the shapes (solved from the paper's prose — the
  * table alone is not dimension-consistent), the LA views V3/V4/V5, and the
  * rewriting the paper reports so tests can bound HADAD's output.
  */
object HybridQueries {

  val F = 12L // features in M

  /** Shapes of each query's synthetic extras given (nT, h, k). */
  final case class Shape(nT: Long, h: Long, k: Long = 400) {
    private val nnzN = math.max(1L, nT / 2)

    /** Per-query metadata for the rewriter (M, N + extras). */
    def meta(q: String): Map[String, Meta] = {
      val base = Map(
        "M"  -> Meta.dense(nT, F),
        "N"  -> Meta.sparse(nT, h, nnzN.toDouble),
        "V3" -> Meta.dense(nT, 1),
        "V4" -> Meta.dense(1, F),
      )
      val extras: Map[String, Meta] = q match {
        case "Q1" => Map("X" -> Meta.dense(h, nT), "u" -> Meta.dense(h, 1),
                         "v" -> Meta.dense(nT, 1))
        case "Q2" => Map("X" -> Meta.dense(h, nT), "u" -> Meta.dense(nT, 1))
        case "Q3" => Map("X" -> Meta.dense(nT, h), "v" -> Meta.dense(h, 1))
        case "Q4" => Map("X" -> Meta.dense(h, nT), "C" -> Meta.dense(nT, h),
                         "v" -> Meta.dense(1, h))
        case "Q5" => Map("X" -> Meta.dense(F, h), "u" -> Meta.dense(nT, 1))
        case "Q6" => Map("X" -> Meta.dense(F, nT), "u" -> Meta.dense(nT, 1),
                         "v" -> Meta.dense(h, 1))
        case "Q7" => Map("X" -> Meta.dense(F, nT), "u" -> Meta.dense(h, 1))
        case "Q8" => Map("X" -> Meta.dense(F, k), "C" -> Meta.dense(k, k),
                         "v" -> Meta.dense(k, 1))
        case "Q9" => Map("X" -> Meta.dense(nT, h), "C" -> Meta.dense(200, nT),
                         "V5" -> Meta.dense(200, F))
        case "Q10" => Map("X" -> Meta.dense(200, nT), "C" -> Meta.dense(200, nT),
                          "V5" -> Meta.dense(200, F))
        case other => sys.error(s"unknown query $other")
      }
      base ++ extras
    }
  }

  private val M = Mat("M"); private val N = Mat("N")
  private val X = Mat("X"); private val C = Mat("C")
  private val u = Mat("u"); private val v = Mat("v")
  private val V3 = Mat("V3"); private val V4 = Mat("V4"); private val V5 = Mat("V5")

  /** LA views over M (materialized; V5 = C·M only where C conforms). */
  def views(q: String): Seq[View] = {
    val base = Seq(View("V3", RowSums(M)), View("V4", ColSums(M)))
    if (q == "Q9" || q == "Q10") base :+ View("V5", Mul(C, M)) else base
  }

  /** (query, original LA part [Table 7], paper-reported rewriting [§9.2.2]). */
  val queries: Vector[(String, Expr, Expr)] = Vector(
    ("Q1",
     Add(RowSums(Mul(X, M)), Mul(Add(Mul(u, T(v)), T(N)), v)),
     Add(Mul(X, V3), Add(Mul(u, Mul(T(v), v)), Mul(T(N), v)))),
    ("Q2",
     Add(Mul(u, ColSums(T(Mul(X, M)))), N),
     Add(Mul(u, T(Mul(X, V3))), N)),
    ("Q3",
     Mul(Mul(Add(N, X), v), ColSums(M)),
     Mul(Add(Mul(N, v), Mul(X, v)), V4)),
    ("Q4",
     Sum(Add(C, Mul(Mul(N, RowSums(Mul(X, M))), v))),
     SAdd(Sum(C), Sum(Mul(Mul(N, Mul(X, V3)), v)))),
    ("Q5",
     Add(Mul(u, ColSums(Mul(M, X))), N),
     Add(Mul(u, Mul(V4, X)), N)),
    ("Q6",
     Add(RowSums(T(Mul(M, X))), Mul(Add(Mul(u, T(v)), N), v)),
     Add(T(Mul(V4, X)), Add(Mul(u, Mul(T(v), v)), Mul(N, v)))),
    ("Q7",
     Add(Mul(Mul(X, N), u), RowSums(T(M))),
     Add(Mul(X, Mul(N, u)), T(V4))),
    ("Q8",
     ScaMul(Trace(Add(C, Mul(Mul(v, ColSums(Mul(M, X))), C))), N),
     ScaMul(SAdd(Trace(C), Trace(Mul(Mul(v, Mul(V4, X)), C))), N)),
    ("Q9",
     Add(ScaMul(Sum(Had(T(ColSums(C)), RowSums(M))), X), N),
     Add(ScaMul(Sum(V5), X), N)),
    ("Q10",
     ScaMul(Sum(Mul(Add(X, C), M)), N),
     ScaMul(SAdd(Sum(Mul(X, M)), Sum(V5)), N)),
  )

  def byId(q: String): (Expr, Expr) =
    queries.collectFirst { case (i, o, r) if i == q => (o, r) }
      .getOrElse(sys.error(s"unknown query $q"))
}
