package repro.drift

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.linalg.{Eigen, Mat}
import repro.stats.Moments

/** PCA-SPLL baseline [Kuncheva & Faithfull, TNNLS 2014].
  *
  * Like the paper's method it keeps the *low*-variance principal components
  * (they are the most change-sensitive), but then models a multivariate
  * Gaussian over the retained subspace and uses the semi-parametric
  * log-likelihood (SPLL) — here with a single mixture component — as the
  * change statistic: the mean squared Mahalanobis distance of the new
  * window's tuples in the retained subspace.
  *
  * The two failure modes the paper reports are structural and reproduce
  * here: (1) no disjunctive modeling, so purely local drift in a stable
  * global mixture is invisible; (2) when the cumulative-variance rule
  * retains (nearly) no informative components, drift goes undetected.
  */
object PcaSpll {

  /** Fitted detector.
    *
    * @param cols       numeric columns (model ordering)
    * @param means      training means (standardization)
    * @param stds       training stds
    * @param components retained eigenvectors (rows), lowest variance first
    * @param variances  eigenvalue (variance) of each retained component,
    *                   floored for Mahalanobis stability
    */
  final case class Model(
      cols: Seq[String],
      means: Array[Double],
      stds: Array[Double],
      components: Array[Array[Double]],
      variances: Array[Double],
  ) extends Serializable {

    /** Squared Mahalanobis distance of one tuple in the retained subspace. */
    def mahalanobis2(x: Array[Double]): Double = {
      val z = Array.tabulate(x.length)(i =>
        if (stds(i) > 0) (x(i) - means(i)) / stds(i) else x(i) - means(i))
      var s = 0.0; var k = 0
      while (k < components.length) {
        val p = Mat.dot(components(k), z)
        s += p * p / variances(k)
        k += 1
      }
      s
    }
  }

  /** Fit on a reference window.
    *
    * @param varianceFraction retain components from the lowest variance up,
    *                         while their cumulative explained variance stays
    *                         below this fraction (paper's experiments: 25%)
    */
  def fit(df: DataFrame, numericCols: Seq[String], varianceFraction: Double = 0.25): Model = {
    val mom = Moments.of(df, numericCols)
    val m = numericCols.length
    val means = mom.means
    val stds = numericCols.indices.map { i =>
      val unit = Array.tabulate(m)(j => if (j == i) 1.0 else 0.0)
      mom.stdOf(unit)
    }.toArray

    // Correlation matrix = covariance of the standardized attributes.
    val cov = mom.covariance
    val corr = Mat.zeros(m, m)
    for (i <- 0 until m; j <- 0 until m) {
      val d = stds(i) * stds(j)
      corr(i, j) = if (d > 0) cov(i, j) / d else (if (i == j) 1.0 else 0.0)
    }
    val eig = Eigen.symmetric(corr)
    val total = eig.values.map(math.max(_, 0.0)).sum.max(1e-12)

    // Ascending order: accumulate the low-variance tail below the fraction.
    val kept = Seq.newBuilder[Int]
    var cum = 0.0
    var k = 0
    var done = false
    while (k < m && !done) {
      cum += math.max(eig.values(k), 0.0) / total
      if (cum < varianceFraction || k == 0) kept += k else done = true
      k += 1
    }
    val idx = kept.result()
    Model(
      numericCols,
      means,
      stds,
      idx.map(eig.vector).toArray,
      idx.map(i => math.max(eig.values(i), 1e-6)).toArray,
    )
  }

  /** SPLL change statistic of `df` w.r.t. the reference model. */
  def drift(df: DataFrame, model: Model): Double = {
    val arr = array(model.cols.map(c => col(c).cast("double")): _*)
    val f = udf((xs: Seq[Double]) => model.mahalanobis2(xs.toArray))
    val row = df.na.drop(model.cols).withColumn("__m", f(arr)).agg(avg(col("__m"))).head()
    if (row.isNullAt(0)) 0.0 else row.getDouble(0)
  }
}
