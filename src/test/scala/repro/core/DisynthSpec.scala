package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec

class DisynthSpec extends SparkSpec {

  import spark.implicits._

  private def linearData(n: Int, seed: Int = 1) = {
    val rnd = new scala.util.Random(seed)
    (1 to n).map { _ =>
      val a = rnd.nextDouble() * 10; val b = rnd.nextDouble() * 10
      (a, b, a + b + rnd.nextGaussian() * 0.01)
    }.toDF("a", "b", "c")
  }

  test("fit learns the additive invariant and score flags violating tuples") {
    val model = Disynth.fit(linearData(500), Seq("a", "b", "c"))
    val test = Seq(
      (2.0, 3.0, 5.0),   // conforming: c = a + b
      (2.0, 3.0, 50.0),  // violating
    ).toDF("a", "b", "c")
    val scores = Disynth.score(test, model).select("violation").as[Double].collect()
    assert(scores(0) < 0.01, s"conforming tuple scored ${scores(0)}")
    assert(scores(1) > 0.1, s"violating tuple scored ${scores(1)}")
  }

  test("score keeps all original columns and appends the requested name") {
    val df = linearData(100)
    val model = Disynth.fit(df, Seq("a", "b", "c"))
    val out = Disynth.score(df, model, "v")
    assert(out.columns.toSeq == Seq("a", "b", "c", "v"))
  }

  test("violation column is always within [0,1]") {
    val model = Disynth.fit(linearData(300), Seq("a", "b", "c"))
    val wild = (1 to 200).map(i => (i * 1000.0, -i * 500.0, i.toDouble)).toDF("a", "b", "c")
    val mm = Disynth.score(wild, model).agg(min(col("violation")), max(col("violation"))).head()
    assert(mm.getDouble(0) >= 0.0 && mm.getDouble(1) <= 1.0)
  }

  test("avgViolation of the training data is near zero") {
    val df = linearData(500)
    val model = Disynth.fit(df, Seq("a", "b", "c"))
    assert(Disynth.avgViolation(df, model) < 0.01)
  }

  test("null numeric values score the maximal violation") {
    val df = linearData(200)
    val model = Disynth.fit(df, Seq("a", "b", "c"))
    val withNull = Seq[(java.lang.Double, java.lang.Double, java.lang.Double)]((1.0, null, 2.0))
      .toDF("a", "b", "c")
    val v = Disynth.score(withNull, model).select("violation").as[Double].head()
    assert(v == 1.0)
  }

  test("disjunctive fit: per-partition invariants beat a global fit on piecewise data") {
    // Figure 2's scenario: three linear pieces keyed by a categorical attr.
    val rnd = new scala.util.Random(2)
    val rows = for (g <- Seq("g1", "g2", "g3"); _ <- 1 to 200) yield {
      val x = rnd.nextDouble() * 10
      val y = g match {
        case "g1" => 2 * x + rnd.nextGaussian() * 0.05
        case "g2" => -x + 30 + rnd.nextGaussian() * 0.05
        case _    => 0.5 * x - 10 + rnd.nextGaussian() * 0.05
      }
      (g, x, y)
    }
    val df = rows.toDF("g", "x", "y")
    val disjModel = Disynth.fit(df, Seq("x", "y"), Seq("g"))
    assert(disjModel.disjunctive.nonEmpty)
    assert(disjModel.disjunctive.head.cases.keySet == Set("g1", "g2", "g3"))
    // A tuple on g1's line but labeled g2 violates; labeled g1 it conforms.
    val probe = Seq(("g1", 5.0, 10.0), ("g2", 5.0, 10.0)).toDF("g", "x", "y")
    val scores = Disynth.score(probe, disjModel).select("violation").as[Double].collect()
    assert(scores(0) < 0.02)
    assert(scores(1) > 0.3)
    // The per-partition minimum σ is far tighter than the global one.
    val globalMin = disjModel.global.inv.conjuncts.map(_.std).min
    val partMins = disjModel.disjunctive.head.cases.values.map(_.inv.conjuncts.map(_.std).min)
    assert(partMins.forall(_ < globalMin))
  }

  test("unseen partition value scores 1 under the compound invariant") {
    val df = Seq(("g1", 1.0), ("g1", 2.0), ("g2", 5.0), ("g2", 6.0)).toDF("g", "x")
    val model = Disynth.fit(df, Seq("x"), Seq("g"))
    val probe = Seq(("g9", 1.5)).toDF("g", "x")
    assert(Disynth.score(probe, model).select("violation").as[Double].head() == 1.0)
  }

  test("partition attributes exceeding maxDistinct are skipped") {
    val df = (1 to 100).map(i => (s"v$i", i.toDouble)).toDF("g", "x")
    val model = Disynth.fit(df, Seq("x"), Seq("g"), Disynth.Config(maxDistinct = 50))
    assert(model.disjunctive.isEmpty)
  }

  test("partitions below minPartRows get no branch (score 1 there)") {
    val df = (Seq(("solo", 1.0)) ++ (1 to 50).map(i => ("big", i.toDouble))).toDF("g", "x")
    val model = Disynth.fit(df, Seq("x"), Seq("g"), Disynth.Config(minPartRows = 2))
    assert(model.disjunctive.head.cases.keySet == Set("big"))
    val probe = Seq(("solo", 1.0)).toDF("g", "x")
    assert(Disynth.score(probe, model).select("violation").as[Double].head() == 1.0)
  }

  test("autoFit assigns numeric columns to projections and small strings to partitions") {
    val df = Seq(("g1", 1.0, 5L), ("g2", 2.0, 6L), ("g1", 3.0, 7L)).toDF("g", "x", "y")
    val model = Disynth.autoFit(df)
    assert(model.numericCols.toSet == Set("x", "y"))
    assert(model.partitionAttrs == Seq("g"))
  }

  test("autoFit excludes requested columns entirely") {
    val df = Seq(("g1", 1.0, 9.0), ("g2", 2.0, 8.0)).toDF("g", "x", "target")
    val model = Disynth.autoFit(df, exclude = Seq("target", "g"))
    assert(model.numericCols == Seq("x"))
    assert(model.partitionAttrs.isEmpty)
  }

  test("autoFit skips high-cardinality string columns") {
    val rows = (1 to 200).map(i => (s"id$i", i.toDouble))
    val df = rows.toDF("id", "x")
    val model = Disynth.autoFit(df)
    assert(model.partitionAttrs.isEmpty)
    assert(model.numericCols == Seq("x"))
  }

  test("fit requires at least one numeric column") {
    val df = Seq(("a", 1.0)).toDF("g", "x")
    intercept[IllegalArgumentException](Disynth.fit(df, Nil, Seq("g")))
  }

  test("drift semantics: violation grows with displacement (quantitative, not Boolean)") {
    val rnd = new scala.util.Random(4)
    val train = (1 to 500).map(_ => (rnd.nextGaussian(), rnd.nextGaussian())).toDF("x", "y")
    val model = Disynth.fit(train, Seq("x", "y"))
    val drifts = Seq(0.0, 5.0, 8.0, 12.0).map { d =>
      val shifted = (1 to 300).map(_ => (rnd.nextGaussian() + d, rnd.nextGaussian())).toDF("x", "y")
      Disynth.avgViolation(shifted, model)
    }
    assert(drifts(0) < 0.02)
    assert(drifts.zip(drifts.tail).forall { case (a, b) => a < b + 1e-9 }, s"not monotone: $drifts")
    assert(drifts.last > 0.5)
  }

  test("fit/score are deterministic for a fixed seed") {
    val df = linearData(200, seed = 9)
    val m1 = Disynth.fit(df, Seq("a", "b", "c"))
    val m2 = Disynth.fit(df, Seq("a", "b", "c"))
    val probe = Seq((1.0, 2.0, 10.0)).toDF("a", "b", "c")
    val v1 = Disynth.score(probe, m1).select("violation").as[Double].head()
    val v2 = Disynth.score(probe, m2).select("violation").as[Double].head()
    assert(v1 == v2)
  }
}
