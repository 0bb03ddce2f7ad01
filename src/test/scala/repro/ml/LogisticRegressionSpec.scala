package repro.ml

import org.apache.spark.sql.functions._
import repro.SparkSpec

class LogisticRegressionSpec extends SparkSpec {

  import spark.implicits._

  private def blobs(n: Int, centers: Seq[(String, Double, Double)], sigma: Double, seed: Int) = {
    val rnd = new scala.util.Random(seed)
    centers.flatMap { case (label, cx, cy) =>
      (1 to n).map(_ => (label, cx + rnd.nextGaussian() * sigma, cy + rnd.nextGaussian() * sigma))
    }.toDF("label", "x", "y")
  }

  test("separable two-class problem reaches high accuracy") {
    val df = blobs(150, Seq(("a", 0.0, 0.0), ("b", 6.0, 6.0)), sigma = 1.0, seed = 1)
    val m = LogisticRegression.fit(df, Seq("x", "y"), "label")
    assert(m.accuracy(df, "label") > 0.98)
  }

  test("three-class problem reaches high accuracy") {
    val df = blobs(120, Seq(("a", 0.0, 0.0), ("b", 8.0, 0.0), ("c", 4.0, 7.0)), sigma = 1.0, seed = 2)
    val m = LogisticRegression.fit(df, Seq("x", "y"), "label")
    assert(m.accuracy(df, "label") > 0.95)
  }

  test("labels are discovered and sorted") {
    val df = blobs(20, Seq(("zebra", 0.0, 0.0), ("ant", 5.0, 5.0)), 0.5, 3)
    val m = LogisticRegression.fit(df, Seq("x", "y"), "label", iters = 30)
    assert(m.labels == Seq("ant", "zebra"))
  }

  test("predict returns a known-class label") {
    val df = blobs(50, Seq(("a", 0.0, 0.0), ("b", 10.0, 10.0)), 0.5, 4)
    val m = LogisticRegression.fit(df, Seq("x", "y"), "label")
    assert(m.predict(Array(0.0, 0.0)) == "a")
    assert(m.predict(Array(10.0, 10.0)) == "b")
  }

  test("transform appends the prediction column") {
    val df = blobs(30, Seq(("a", 0.0, 0.0), ("b", 6.0, 6.0)), 0.5, 5)
    val out = LogisticRegression.fit(df, Seq("x", "y"), "label", iters = 50).transform(df, "p")
    assert(out.columns.contains("p"))
    assert(out.filter(col("p") === col("label")).count() >= 58)
  }

  test("accuracy on garbage data is near chance, not near one") {
    // Features carry no signal: accuracy ≈ 1/2 for two balanced classes.
    val rnd = new scala.util.Random(6)
    val df = (1 to 400).map(i => (if (i % 2 == 0) "a" else "b", rnd.nextGaussian(), rnd.nextGaussian()))
      .toDF("label", "x", "y")
    val m = LogisticRegression.fit(df, Seq("x", "y"), "label", iters = 50)
    val acc = m.accuracy(df, "label")
    assert(acc < 0.65, s"suspiciously high accuracy $acc on noise")
  }

  test("standardization handles very different feature scales") {
    val rnd = new scala.util.Random(7)
    val df = (1 to 300).map { i =>
      val cls = if (i % 2 == 0) "a" else "b"
      val base = if (cls == "a") 0.0 else 3.0
      (cls, (base + rnd.nextGaussian()) * 1e6, base + rnd.nextGaussian() * 0.5)
    }.toDF("label", "big", "small")
    val m = LogisticRegression.fit(df, Seq("big", "small"), "label")
    assert(m.accuracy(df, "label") > 0.9)
  }

  test("empty training data is rejected") {
    val df = Seq.empty[(String, Double)].toDF("label", "x")
    intercept[IllegalArgumentException](LogisticRegression.fit(df, Seq("x"), "label"))
  }
}
