package repro.ml

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.linalg.{Mat, Solve}
import repro.stats.Moments

/** Closed-form ordinary least squares on Spark.
  *
  * The normal equations `(X̃ᵀX̃) β = X̃ᵀy` (X̃ = 1-augmented features) are
  * assembled from one [[Moments]] pass over `features :+ target` — the same
  * single-scan Gram computation the invariant synthesizer uses — and solved
  * on the driver. A small ridge keeps deliberately collinear designs (the
  * airlines experiment trains on `arr−dep ≡ duration` data) solvable; ridge
  * → the minimum-norm-flavoured solution, which is exactly the implicit
  * reliance on the data invariant that the paper's TML case study exposes.
  */
object LinearRegression {

  /** A fitted model: ŷ = intercept + Σ weights(i)·x(i). */
  final case class Model(features: Seq[String], intercept: Double, weights: Array[Double])
      extends Serializable {

    def predict(x: Array[Double]): Double = intercept + Mat.dot(weights, x)

    /** Append column `outCol` with predictions. */
    def transform(df: DataFrame, outCol: String = "prediction"): DataFrame = {
      val self = this
      val arr = array(features.map(c => col(c).cast("double")): _*)
      val f = udf((xs: Seq[Double]) => self.predict(xs.toArray))
      df.withColumn(outCol, f(arr))
    }

    /** Mean absolute error of predictions against `target` on `df`. */
    def mae(df: DataFrame, target: String): Double =
      transform(df, "__p")
        .agg(avg(abs(col("__p") - col(target).cast("double"))))
        .head().getDouble(0)
  }

  /** Fit by normal equations.
    *
    * @param ridge λ added to the (feature-block) diagonal; relative to the
    *              mean diagonal magnitude so it is scale-free. Kept tiny:
    *              it exists to make exactly-singular systems solvable, and
    *              any larger value visibly biases coefficients on features
    *              with large numeric scale (e.g. hour columns standing in
    *              for minutes)
    */
  def fit(df: DataFrame, features: Seq[String], target: String, ridge: Double = 1e-10): Model = {
    require(features.nonEmpty, "LinearRegression.fit: no features")
    require(!features.contains(target), "LinearRegression.fit: target among features")
    val mom = Moments.of(df, features :+ target)
    val m = features.length
    val ti = mom.idx(target)

    val a = Mat.zeros(m + 1, m + 1)
    a(0, 0) = mom.n.toDouble
    for (i <- 0 until m) {
      a(0, i + 1) = mom.sums(i); a(i + 1, 0) = mom.sums(i)
      for (j <- 0 until m) a(i + 1, j + 1) = mom.gram(i, j)
    }
    val b = new Array[Double](m + 1)
    b(0) = mom.sums(ti)
    for (i <- 0 until m) b(i + 1) = mom.gram(i, ti)

    val diagScale = (0 to m).map(i => a(i, i)).sum / (m + 1)
    val beta = Solve.solve(a, b, ridge * math.max(diagScale, 1.0))
    Model(features, beta(0), beta.drop(1))
  }
}
