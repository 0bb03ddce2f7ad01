package repro.stats

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.linalg.Mat

/** First and second moments of a set of numeric columns, computed in a
  * single distributed scan.
  *
  * This is the paper's §4.3 scheme — `XᵀX = Σᵢ tᵢtᵢᵀ`, accumulated
  * partition-wise in O(m²) memory — expressed through Catalyst: one
  * `agg(count, sum(xᵢ), sum(xᵢ·xⱼ) …)` call, so Spark handles partial
  * aggregation, codegen, and the shuffle-free final merge. Everything
  * downstream (PCA invariants, OLS, per-projection μ/σ) is derived from
  * this one pass.
  *
  * @param n    row count (rows with a null in any requested column dropped)
  * @param cols column names in order
  * @param sums Σ xᵢ per column
  * @param gram Σ xᵢ·xⱼ, an m×m symmetric matrix
  */
final case class Moments(n: Long, cols: Seq[String], sums: Array[Double], gram: Mat) {
  require(cols.length == sums.length && gram.rows == cols.length && gram.cols == cols.length,
    "Moments: inconsistent dimensions")

  /** Index of a column name. */
  def idx(c: String): Int = {
    val i = cols.indexOf(c); require(i >= 0, s"Moments: unknown column $c"); i
  }

  /** Mean vector. */
  def means: Array[Double] = sums.map(_ / math.max(n, 1L))

  /** Mean of the linear form wᵀx (w over `cols`). */
  def meanOf(w: Array[Double]): Double = Mat.dot(w, means)

  /** E[(wᵀx)²] of the linear form. */
  def secondMomentOf(w: Array[Double]): Double = Mat.dot(w, gram * w) / math.max(n, 1L)

  /** Population variance of the linear form wᵀx; clamped at 0 against
    * floating-point cancellation on (near-)exact invariants.
    */
  def varianceOf(w: Array[Double]): Double = {
    val mu = meanOf(w)
    math.max(0.0, secondMomentOf(w) - mu * mu)
  }

  /** Population standard deviation of the linear form wᵀx. */
  def stdOf(w: Array[Double]): Double = math.sqrt(varianceOf(w))

  /** Population covariance matrix (Gram/n − μμᵀ). */
  def covariance: Mat = {
    val m = cols.length
    val mu = means
    val out = Mat.zeros(m, m)
    var i = 0
    while (i < m) {
      var j = 0
      while (j < m) { out(i, j) = gram(i, j) / math.max(n, 1L) - mu(i) * mu(j); j += 1 }
      i += 1
    }
    out
  }

  /** Gram matrix of the 1-augmented data `D′ = [1⃗ ; X]`: the (m+1)×(m+1)
    * matrix `D′ᵀD′ = [[n, sᵀ],[s, XᵀX]]` that Algorithm 1 eigendecomposes.
    */
  def augmentedGram: Mat = {
    val m = cols.length
    val out = Mat.zeros(m + 1, m + 1)
    out(0, 0) = n.toDouble
    var i = 0
    while (i < m) {
      out(0, i + 1) = sums(i); out(i + 1, 0) = sums(i)
      var j = 0
      while (j < m) { out(i + 1, j + 1) = gram(i, j); j += 1 }
      i += 1
    }
    out
  }
}

object Moments {

  /** Compute [[Moments]] over `columns` of `df` in one scan.
    *
    * Rows containing a null/NaN in any of the columns are excluded — the
    * paper assumes fully-numeric tuples, and a NaN would poison every sum.
    */
  def of(df: DataFrame, columns: Seq[String]): Moments = {
    require(columns.nonEmpty, "Moments.of: no columns")
    val m = columns.length
    val cast = columns.map(c => col(c).cast("double").as(c))
    val clean = df.select(cast: _*).na.drop()
    val sumExprs = columns.map(c => sum(col(c)))
    val gramExprs =
      for (i <- 0 until m; j <- i until m)
        yield sum(col(columns(i)) * col(columns(j)))
    val row = clean.agg(count(lit(1)), (sumExprs ++ gramExprs): _*).head()

    fromRow(row, 0, columns)
  }

  /** Compute per-group [[Moments]] over `columns`, grouped by the (string-
    * rendered) values of `groupCol`, in a single scan.
    *
    * This powers disjunctive-invariant synthesis: one `groupBy(A).agg(...)`
    * job yields the moments of *every* partition `D_l = σ_{A=v_l}(D)` at
    * once, instead of one scan per distinct value. Rows where `groupCol` is
    * null are excluded (they match no `(A = c)▷φ` branch anyway).
    */
  def byGroup(df: DataFrame, columns: Seq[String], groupCol: String): Map[String, Moments] = {
    require(columns.nonEmpty, "Moments.byGroup: no columns")
    val m = columns.length
    val cast = col(groupCol).cast("string").as("__grp") +:
      columns.map(c => col(c).cast("double").as(c))
    val clean = df.select(cast: _*).na.drop()
    val sumExprs = columns.map(c => sum(col(c)))
    val gramExprs =
      for (i <- 0 until m; j <- i until m)
        yield sum(col(columns(i)) * col(columns(j)))
    val rows = clean.groupBy(col("__grp")).agg(count(lit(1)), (sumExprs ++ gramExprs): _*).collect()
    rows.map(r => r.getString(0) -> fromRow(r, 1, columns)).toMap
  }

  /** Decode (count, sums, upper-triangular gram) laid out from `offset`. */
  private def fromRow(row: org.apache.spark.sql.Row, offset: Int, columns: Seq[String]): Moments = {
    val m = columns.length
    val n = row.getLong(offset)
    val sums = Array.tabulate(m)(i => if (row.isNullAt(offset + 1 + i)) 0.0 else row.getDouble(offset + 1 + i))
    val gram = Mat.zeros(m, m)
    var k = offset + 1 + m
    for (i <- 0 until m; j <- i until m) {
      val v = if (row.isNullAt(k)) 0.0 else row.getDouble(k)
      gram(i, j) = v; gram(j, i) = v
      k += 1
    }
    Moments(n, columns, sums, gram)
  }
}
