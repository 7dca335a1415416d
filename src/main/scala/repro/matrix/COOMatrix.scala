package repro.matrix

import breeze.linalg.DenseMatrix
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.{Hist, Meta}

/** A matrix distributed as a coordinate-format DataFrame with schema
  * `(i: Long, j: Long, v: Double)` (0-based), plus logical dimensions.
  * Zero cells are not stored; duplicate (i,j) pairs are not allowed.
  *
  * This is the execution substrate standing in for the paper's LA backends:
  * every `L_ops` operation is implemented over it with DataFrame joins and
  * aggregations (Catalyst plans), except inverse/determinant/Cholesky/
  * element-exp which gather to a local Breeze matrix (they are not
  * data-parallel-friendly and the paper's backends also run them locally).
  */
final case class COOMatrix(df: DataFrame, rows: Long, cols: Long) {

  def spark: SparkSession = df.sparkSession

  def nnz: Long = df.count()

  def cells: Long = rows * cols

  /** Exact metadata for the rewriter; histograms only when `mnc` is set. */
  def computeMeta(mnc: Boolean = false): Meta = {
    val n = nnz
    val hist = if (!mnc || rows > Meta.MaxHistDim || cols > Meta.MaxHistDim) None
    else {
      val hr = Array.fill(rows.toInt)(0.0)
      df.groupBy("i").count().collect().foreach(r => hr(r.getLong(0).toInt) = r.getLong(1).toDouble)
      val hc = Array.fill(cols.toInt)(0.0)
      df.groupBy("j").count().collect().foreach(r => hc(r.getLong(0).toInt) = r.getLong(1).toDouble)
      Some(Hist(hr, hc))
    }
    Meta(rows, cols, n.toDouble, hist)
  }

  /** Gather into a dense Breeze matrix (guarded; local ops only). */
  def toBreeze(maxCells: Long = 8_000_000L): DenseMatrix[Double] = {
    require(cells <= maxCells, s"refusing to densify ${rows}x$cols locally")
    val m = DenseMatrix.zeros[Double](rows.toInt, cols.toInt)
    df.collect().foreach(r => m(r.getLong(0).toInt, r.getLong(1).toInt) = r.getDouble(2))
    m
  }
}

object COOMatrix {

  val schema: StructType = StructType(Seq(
    StructField("i", LongType, nullable = false),
    StructField("j", LongType, nullable = false),
    StructField("v", DoubleType, nullable = false),
  ))

  /** Distribute a local dense matrix, dropping (near-)zero cells. */
  def fromBreeze(spark: SparkSession, m: DenseMatrix[Double], eps: Double = 0.0): COOMatrix = {
    val entries = for {
      i <- 0 until m.rows
      j <- 0 until m.cols
      if math.abs(m(i, j)) > eps
    } yield Row(i.toLong, j.toLong, m(i, j))
    val df = spark.createDataFrame(
      spark.sparkContext.parallelize(entries, math.max(1, entries.size / 250000 + 1)), schema)
    COOMatrix(df, m.rows.toLong, m.cols.toLong)
  }

  /** Wrap a DataFrame (columns are selected/cast to the COO schema). */
  def apply(df: DataFrame, rows: Long, cols: Long): COOMatrix =
    new COOMatrix(
      df.select(col("i").cast(LongType) as "i",
                col("j").cast(LongType) as "j",
                col("v").cast(DoubleType) as "v"),
      rows, cols)
}

/** Synthetic matrix generators at the scaled-down profiles of the paper's
  * Tables 4–5 (real sparse datasets are substituted by synthetic matrices
  * with the same shape/sparsity character — see DESIGN.md).
  */
object Gen {

  /** Dense uniform(0.1, 1.1) matrix. */
  def dense(spark: SparkSession, rows: Long, cols: Long, seed: Long = 7): COOMatrix = {
    val df = spark.range(rows * cols).select(
      (col("id") / cols).cast(LongType) as "i",
      (col("id") % cols).cast(LongType) as "j",
      (rand(seed) + 0.1) as "v",
    )
    COOMatrix(df, rows, cols)
  }

  /** Sparse matrix with ~`nnz` uniformly-placed non-zeros. */
  def sparse(spark: SparkSession, rows: Long, cols: Long, nnz: Long, seed: Long = 8): COOMatrix = {
    val df = spark.range(nnz).select(
      (rand(seed) * rows).cast(LongType) as "i",
      (rand(seed + 1) * cols).cast(LongType) as "j",
      (rand(seed + 2) + 0.1) as "v",
    ).dropDuplicates("i", "j")
    COOMatrix(df, rows, cols)
  }

  /** Dense column vector. */
  def vector(spark: SparkSession, rows: Long, seed: Long = 9): COOMatrix =
    dense(spark, rows, 1, seed)

  /** Symmetric positive-definite matrix, distributed (built locally). */
  def spd(spark: SparkSession, n: Int, seed: Long = 10): COOMatrix =
    COOMatrix.fromBreeze(spark, LocalExec.randSPD(n, seed))
}
