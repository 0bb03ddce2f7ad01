package repro.stats

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

class MomentsSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  private val cols = Seq("l_quantity", "l_extendedprice", "l_discount")
  private lazy val mom = Moments.of(li, cols)

  test("row count matches the DataFrame count") {
    assert(mom.n == li.count())
  }

  test("sums match Spark aggregation") {
    val row = li.agg(sum(col("l_quantity")), sum(col("l_extendedprice")), sum(col("l_discount"))).head()
    for (i <- cols.indices)
      assert(math.abs(mom.sums(i) - row.getDouble(i)) < 1e-6 * (1 + math.abs(row.getDouble(i))))
  }

  test("sums and cross-products match the DuckDB oracle") {
    // Aggregates are kept at modest magnitude: the oracle compares to six
    // absolute decimals, and engines sum floats in different orders.
    val sparkDf = li.agg(
      sum(col("l_quantity")).as("s_q"),
      sum(col("l_quantity") * col("l_discount")).as("s_qd"),
      sum(col("l_discount") * col("l_discount")).as("s_dd"),
    )
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT sum(CAST(l_quantity AS DOUBLE)) AS s_q,
        |       sum(CAST(l_quantity AS DOUBLE) * CAST(l_discount AS DOUBLE)) AS s_qd,
        |       sum(CAST(l_discount AS DOUBLE) * CAST(l_discount AS DOUBLE)) AS s_dd
        |FROM lineitem""".stripMargin,
      "lineitem" -> li)
    // And Moments agrees with the same Spark aggregates.
    val row = sparkDf.head()
    assert(math.abs(mom.sums(0) - row.getDouble(0)) < 1e-6 * (1 + math.abs(row.getDouble(0))))
    assert(math.abs(mom.gram(0, 2) - row.getDouble(1)) < 1e-6 * (1 + math.abs(row.getDouble(1))))
    assert(math.abs(mom.gram(2, 2) - row.getDouble(2)) < 1e-6 * (1 + math.abs(row.getDouble(2))))
  }

  test("gram matrix is symmetric") {
    for (i <- cols.indices; j <- cols.indices)
      assert(mom.gram(i, j) == mom.gram(j, i))
  }

  test("means match Spark avg") {
    val row = li.agg(avg(col("l_quantity")), avg(col("l_extendedprice")), avg(col("l_discount"))).head()
    val means = mom.means
    for (i <- cols.indices)
      assert(math.abs(means(i) - row.getDouble(i)) < 1e-8 * (1 + math.abs(row.getDouble(i))))
  }

  test("per-column variance via unit projection matches Spark var_pop") {
    val row = li.agg(var_pop(col("l_quantity")), var_pop(col("l_discount"))).head()
    val vQ = mom.varianceOf(Array(1.0, 0.0, 0.0))
    val vD = mom.varianceOf(Array(0.0, 0.0, 1.0))
    assert(math.abs(vQ - row.getDouble(0)) < 1e-6 * (1 + row.getDouble(0)))
    assert(math.abs(vD - row.getDouble(1)) < 1e-6 * (1 + row.getDouble(1)))
  }

  test("projection variance matches Spark var_pop of the linear form") {
    val w = Array(0.5, 0.001, -2.0)
    val form = col("l_quantity") * 0.5 + col("l_extendedprice") * 0.001 - col("l_discount") * 2.0
    val expected = li.agg(var_pop(form)).head().getDouble(0)
    assert(math.abs(mom.varianceOf(w) - expected) < 1e-5 * (1 + expected))
  }

  test("projection mean matches Spark avg of the linear form") {
    val w = Array(1.0, -0.5, 3.0)
    val form = col("l_quantity") - col("l_extendedprice") * 0.5 + col("l_discount") * 3.0
    val expected = li.agg(avg(form)).head().getDouble(0)
    assert(math.abs(mom.meanOf(w) - expected) < 1e-6 * (1 + math.abs(expected)))
  }

  test("covariance diagonal equals variances and matches covar_pop off-diagonal") {
    val cov = mom.covariance
    assert(math.abs(cov(0, 0) - mom.varianceOf(Array(1.0, 0.0, 0.0))) < 1e-8)
    val expected = li.agg(covar_pop(col("l_quantity"), col("l_discount"))).head().getDouble(0)
    assert(math.abs(cov(0, 2) - expected) < 1e-6 * (1 + math.abs(expected)))
  }

  test("augmentedGram embeds n, sums, and gram") {
    val g = mom.augmentedGram
    assert(g(0, 0) == mom.n.toDouble)
    for (i <- cols.indices) {
      assert(g(0, i + 1) == mom.sums(i))
      assert(g(i + 1, 0) == mom.sums(i))
      for (j <- cols.indices) assert(g(i + 1, j + 1) == mom.gram(i, j))
    }
  }

  test("rows with nulls are dropped") {
    import spark.implicits._
    val df = Seq[(java.lang.Double, java.lang.Double)]((1.0, 2.0), (null, 3.0), (4.0, 5.0))
      .toDF("a", "b")
    val m = Moments.of(df, Seq("a", "b"))
    assert(m.n == 2)
    assert(m.sums(0) == 5.0 && m.sums(1) == 7.0)
  }

  test("byGroup partitions moments by the group column") {
    import spark.implicits._
    val df = Seq(("x", 1.0), ("x", 3.0), ("y", 10.0)).toDF("g", "v")
    val by = Moments.byGroup(df, Seq("v"), "g")
    assert(by.keySet == Set("x", "y"))
    assert(by("x").n == 2 && by("x").sums(0) == 4.0 && by("x").gram(0, 0) == 10.0)
    assert(by("y").n == 1 && by("y").sums(0) == 10.0)
  }

  test("byGroup matches a DuckDB grouped aggregate") {
    val df = SynthData.orders(spark, sf = 0.002)
    val by = Moments.byGroup(df, Seq("o_totalprice"), "o_orderstatus")
    val sparkDf = df.groupBy(col("o_orderstatus")).agg(
      count(lit(1)).cast("double").as("n"),
      sum(col("o_totalprice")).as("s"))
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT o_orderstatus, CAST(count(*) AS DOUBLE) AS n,
        |       sum(CAST(o_totalprice AS DOUBLE)) AS s
        |FROM orders GROUP BY o_orderstatus""".stripMargin,
      "orders" -> df)
    sparkDf.collect().foreach { r =>
      val m = by(r.getString(0))
      assert(m.n.toDouble == r.getDouble(1))
      assert(math.abs(m.sums(0) - r.getDouble(2)) < 1e-6 * (1 + math.abs(r.getDouble(2))))
    }
  }

  test("byGroup drops null group keys and null numerics") {
    import spark.implicits._
    val df = Seq[(String, java.lang.Double)](("x", 1.0), (null, 2.0), ("x", null))
      .toDF("g", "v")
    val by = Moments.byGroup(df, Seq("v"), "g")
    assert(by.keySet == Set("x"))
    assert(by("x").n == 1)
  }

  test("empty column list is rejected") {
    intercept[IllegalArgumentException](Moments.of(li, Nil))
  }

  test("variance is clamped non-negative on exact linear dependence") {
    import spark.implicits._
    val df = (1 to 100).map(i => (i.toDouble, 2.0 * i)).toDF("a", "b")
    val m = Moments.of(df, Seq("a", "b"))
    // b − 2a ≡ 0: variance must be exactly 0 after clamping.
    assert(m.varianceOf(Array(-2.0, 1.0)) == 0.0)
    assert(m.stdOf(Array(-2.0, 1.0)) == 0.0)
  }
}
