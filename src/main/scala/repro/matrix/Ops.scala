package repro.matrix

import org.apache.spark.sql.functions._
import breeze.linalg.{cholesky, det => bdet, inv => binv}

/** Distributed implementations of every `L_ops` operation over [[COOMatrix]].
  *
  * All data-parallel operators are expressed with DataFrame joins and
  * aggregations so they run through Catalyst; inverse, determinant,
  * Cholesky and element-exp gather to Breeze (see COOMatrix doc).
  */
object Ops {

  /** Matrix product A·B via join on the contraction index + sum-aggregate. */
  def multiply(a: COOMatrix, b: COOMatrix): COOMatrix = {
    require(a.cols == b.rows, s"dims: ${a.rows}x${a.cols} * ${b.rows}x${b.cols}")
    val l = a.df.select(col("i") as "ai", col("j") as "k", col("v") as "av")
    val r = b.df.select(col("i") as "bk", col("j") as "bj", col("v") as "bv")
    val df = l.join(r, col("k") === col("bk"))
      .groupBy(col("ai") as "i", col("bj") as "j")
      .agg(sum(col("av") * col("bv")) as "v")
    COOMatrix(df, a.rows, b.cols)
  }

  /** A+B via union + sum-aggregate (cells present in either operand). */
  def add(a: COOMatrix, b: COOMatrix): COOMatrix = {
    requireSameShape(a, b, "+")
    COOMatrix(a.df.unionByName(b.df).groupBy("i", "j").agg(sum("v") as "v"), a.rows, a.cols)
  }

  def subtract(a: COOMatrix, b: COOMatrix): COOMatrix =
    add(a, scalarMul(-1.0, b))

  /** Element-wise (Hadamard) product: inner join on coordinates. */
  def hadamard(a: COOMatrix, b: COOMatrix): COOMatrix = {
    requireSameShape(a, b, "*")
    val r  = b.df.select(col("i") as "bi", col("j") as "bj", col("v") as "bv")
    val df = a.df.join(r, col("i") === col("bi") && col("j") === col("bj"))
      .select(col("i"), col("j"), (col("v") * col("bv")) as "v")
    COOMatrix(df, a.rows, a.cols)
  }

  /** Element-wise division A/B on B's support (B is non-zero there). */
  def divide(a: COOMatrix, b: COOMatrix): COOMatrix = {
    requireSameShape(a, b, "/")
    val r  = b.df.select(col("i") as "bi", col("j") as "bj", col("v") as "bv")
    val df = a.df.join(r, col("i") === col("bi") && col("j") === col("bj"))
      .select(col("i"), col("j"), (col("v") / col("bv")) as "v")
    COOMatrix(df, a.rows, a.cols)
  }

  def scalarMul(c: Double, a: COOMatrix): COOMatrix =
    COOMatrix(a.df.select(col("i"), col("j"), (col("v") * lit(c)) as "v"), a.rows, a.cols)

  def transpose(a: COOMatrix): COOMatrix =
    COOMatrix(a.df.select(col("j") as "i", col("i") as "j", col("v")), a.cols, a.rows)

  def rowSums(a: COOMatrix): COOMatrix =
    COOMatrix(a.df.groupBy("i").agg(sum("v") as "v").select(col("i"), lit(0L) as "j", col("v")),
              a.rows, 1)

  def colSums(a: COOMatrix): COOMatrix =
    COOMatrix(a.df.groupBy("j").agg(sum("v") as "v").select(lit(0L) as "i", col("j"), col("v")),
              1, a.cols)

  def sumAll(a: COOMatrix): Double =
    a.df.agg(sum("v")).collect()(0) match {
      case r if r.isNullAt(0) => 0.0
      case r                  => r.getDouble(0)
    }

  def trace(a: COOMatrix): Double =
    a.df.filter(col("i") === col("j")).agg(sum("v")).collect()(0) match {
      case r if r.isNullAt(0) => 0.0
      case r                  => r.getDouble(0)
    }

  def diag(a: COOMatrix): COOMatrix =
    COOMatrix(a.df.filter(col("i") === col("j")).select(col("i"), lit(0L) as "j", col("v")),
              math.min(a.rows, a.cols), 1)

  /** Column concatenation [A, B]. */
  def cbind(a: COOMatrix, b: COOMatrix): COOMatrix = {
    require(a.rows == b.rows, s"cbind rows: ${a.rows} vs ${b.rows}")
    val shifted = b.df.select(col("i"), (col("j") + lit(a.cols)) as "j", col("v"))
    COOMatrix(a.df.unionByName(shifted), a.rows, a.cols + b.cols)
  }

  // Local (gather) operations — not data-parallel-friendly.

  def inverse(a: COOMatrix): COOMatrix = {
    require(a.rows == a.cols, "inverse of a non-square matrix")
    COOMatrix.fromBreeze(a.spark, binv(a.toBreeze()))
  }

  def determinant(a: COOMatrix): Double = bdet(a.toBreeze())

  def choleskyL(a: COOMatrix): COOMatrix =
    COOMatrix.fromBreeze(a.spark, cholesky(a.toBreeze()))

  /** Element-wise exponential; exp(0)=1 makes the result dense. */
  def expElem(a: COOMatrix): COOMatrix =
    COOMatrix.fromBreeze(a.spark, breeze.numerics.exp(a.toBreeze()))

  /** Number of scalar products a·b performs (join-pair count) — the
    * deterministic compute metric used by the Morpheus benchmark, where the
    * paper's gains are flop-bound rather than output-size-bound.
    */
  def multiplyPairs(a: COOMatrix, b: COOMatrix): Long = {
    val ac = a.df.groupBy("j").count().select(col("j") as "k", col("count") as "ca")
    val bc = b.df.groupBy("i").count().select(col("i") as "k2", col("count") as "cb")
    val r  = ac.join(bc, col("k") === col("k2"))
      .agg(sum(col("ca") * col("cb"))).collect()(0)
    if (r.isNullAt(0)) 0L else r.getLong(0)
  }

  private def requireSameShape(a: COOMatrix, b: COOMatrix, op: String): Unit =
    require(a.rows == b.rows && a.cols == b.cols,
            s"dims: ${a.rows}x${a.cols} $op ${b.rows}x${b.cols}")
}
