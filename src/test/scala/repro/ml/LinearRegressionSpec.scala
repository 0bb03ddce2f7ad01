package repro.ml

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class LinearRegressionSpec extends SparkSpec {

  import spark.implicits._

  test("recovers exact coefficients on noise-free linear data") {
    val rnd = new scala.util.Random(1)
    val df = (1 to 300).map { _ =>
      val a = rnd.nextDouble() * 10; val b = rnd.nextDouble() * 5
      (a, b, 3.0 * a - 2.0 * b + 7.0)
    }.toDF("a", "b", "y")
    val m = LinearRegression.fit(df, Seq("a", "b"), "y")
    assert(math.abs(m.intercept - 7.0) < 1e-4)
    assert(math.abs(m.weights(0) - 3.0) < 1e-5)
    assert(math.abs(m.weights(1) + 2.0) < 1e-5)
  }

  test("single-feature slope/intercept match DuckDB regr_slope/regr_intercept") {
    val rnd = new scala.util.Random(2)
    val df = (1 to 500).map { _ =>
      val x = rnd.nextDouble() * 100
      (x, 1.5 * x + 10 + rnd.nextGaussian() * 5)
    }.toDF("x", "y")
    val m = LinearRegression.fit(df, Seq("x"), "y", ridge = 0.0)
    val sparkDf = df.agg(
      lit(m.weights(0)).as("slope"),
      lit(m.intercept).as("icept"))
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT regr_slope(CAST(y AS DOUBLE), CAST(x AS DOUBLE)) AS slope,
        |       regr_intercept(CAST(y AS DOUBLE), CAST(x AS DOUBLE)) AS icept
        |FROM pts""".stripMargin,
      "pts" -> df)
  }

  test("predictions on training data have near-zero MAE for noise-free data") {
    val df = (1 to 100).map(i => (i.toDouble, 2.0 * i + 1)).toDF("x", "y")
    val m = LinearRegression.fit(df, Seq("x"), "y")
    assert(m.mae(df, "y") < 1e-4)
  }

  test("transform appends predictions without disturbing other columns") {
    val df = (1 to 50).map(i => (i.toDouble, i * 3.0)).toDF("x", "y")
    val m = LinearRegression.fit(df, Seq("x"), "y")
    val out = m.transform(df, "pred")
    assert(out.columns.toSeq == Seq("x", "y", "pred"))
    val r = out.filter(col("x") === 10.0).select("pred").as[Double].head()
    assert(math.abs(r - 30.0) < 1e-6)
  }

  test("collinear features are handled via ridge (airlines scenario)") {
    // b == 2a exactly: the normal equations are singular without ridge.
    val rnd = new scala.util.Random(3)
    val df = (1 to 200).map { _ =>
      val a = rnd.nextDouble() * 10
      (a, 2 * a, 5 * a + rnd.nextGaussian() * 0.01)
    }.toDF("a", "b", "y")
    val m = LinearRegression.fit(df, Seq("a", "b"), "y")
    // Prediction still works: w_a + 2·w_b ≈ 5.
    assert(math.abs(m.weights(0) + 2 * m.weights(1) - 5.0) < 0.01)
    assert(m.mae(df, "y") < 0.1)
  }

  test("mae against a known constant predictor") {
    val df = Seq((1.0, 10.0), (1.0, 14.0)).toDF("x", "y")
    val m = LinearRegression.Model(Seq("x"), 12.0, Array(0.0))
    assert(math.abs(m.mae(df, "y") - 2.0) < 1e-12)
  }

  test("target among features is rejected") {
    val df = Seq((1.0, 2.0)).toDF("x", "y")
    intercept[IllegalArgumentException](LinearRegression.fit(df, Seq("x", "y"), "y"))
  }

  test("multivariate fit matches the closed form computed by hand (tiny system)") {
    // y = x1 + x2 on 4 points; unique LS solution.
    val df = Seq((0.0, 0.0, 0.0), (1.0, 0.0, 1.0), (0.0, 1.0, 1.0), (1.0, 1.0, 2.0))
      .toDF("x1", "x2", "y")
    val m = LinearRegression.fit(df, Seq("x1", "x2"), "y", ridge = 0.0)
    assert(math.abs(m.intercept) < 1e-10)
    assert(math.abs(m.weights(0) - 1.0) < 1e-10)
    assert(math.abs(m.weights(1) - 1.0) < 1e-10)
  }
}
