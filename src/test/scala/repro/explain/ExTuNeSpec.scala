package repro.explain

import repro.SparkSpec
import repro.core.Disynth

class ExTuNeSpec extends SparkSpec {

  import spark.implicits._

  private def train2d(n: Int = 500, seed: Int = 1) = {
    val rnd = new scala.util.Random(seed)
    (1 to n).map(_ => (rnd.nextGaussian(), rnd.nextGaussian())).toDF("a", "b")
  }

  test("conforming tuple gets zero responsibility everywhere") {
    val model = Disynth.fit(train2d(), Seq("a", "b"))
    val resp = ExTuNe.tupleResponsibility(model, Map.empty, Array(0.1, -0.2))
    assert(resp.forall(_ == 0.0))
  }

  test("single violating attribute carries responsibility 1, others 1/2") {
    val model = Disynth.fit(train2d(), Seq("a", "b"))
    // a is 20σ off, b typical: fixing a alone conforms (K=0 → resp 1);
    // fixing b first still needs a (K=1 → resp 1/2).
    val resp = ExTuNe.tupleResponsibility(model, Map.empty, Array(20.0, 0.0))
    assert(resp(0) == 1.0, s"resp=${resp.toSeq}")
    assert(resp(1) == 0.5, s"resp=${resp.toSeq}")
  }

  test("two violating attributes: each needs one more fix (resp 1/2), bystander needs two (1/3)") {
    val rnd = new scala.util.Random(2)
    val df = (1 to 500).map(_ => (rnd.nextGaussian(), rnd.nextGaussian(), rnd.nextGaussian()))
      .toDF("a", "b", "c")
    val model = Disynth.fit(df, Seq("a", "b", "c"))
    val resp = ExTuNe.tupleResponsibility(model, Map.empty, Array(20.0, -20.0, 0.0))
    assert(resp(0) == 0.5 && resp(1) == 0.5, s"resp=${resp.toSeq}")
    assert(math.abs(resp(2) - 1.0 / 3) < 1e-12, s"resp=${resp.toSeq}")
  }

  test("aggregate averages responsibilities and ranks the planted cause first") {
    val rnd = new scala.util.Random(3)
    val train = (1 to 600).map(_ => (rnd.nextGaussian(), rnd.nextGaussian())).toDF("a", "b")
    val model = Disynth.fit(train, Seq("a", "b"))
    val test = (1 to 100).map(_ => (15.0 + rnd.nextGaussian(), rnd.nextGaussian())).toDF("a", "b")
    val agg = ExTuNe.aggregate(test, model)
    val m = agg.toMap
    assert(m("a") > m("b"))
    assert(m("a") > 0.9)
  }

  test("disjunctive model: intervention uses the partition's means") {
    // Partition g=hi sits at 100, g=lo at 0. A g=hi tuple with one bad attr
    // must be repaired toward 100 (the partition mean), not the global ~50.
    val rnd = new scala.util.Random(4)
    val rows =
      (1 to 300).map(_ => ("hi", 100 + rnd.nextGaussian(), 100 + rnd.nextGaussian())) ++
      (1 to 300).map(_ => ("lo", rnd.nextGaussian(), rnd.nextGaussian()))
    val df = rows.toDF("g", "a", "b")
    val model = Disynth.fit(df, Seq("a", "b"), Seq("g"))
    val resp = ExTuNe.tupleResponsibility(model, Map("g" -> Some("hi")), Array(50.0, 100.0))
    assert(resp(0) == 1.0, s"resp=${resp.toSeq}")
    assert(resp(1) == 0.5, s"resp=${resp.toSeq}")
  }

  test("unseen partition value: nothing explains the violation, all responsibilities 0") {
    val df = Seq(("g1", 1.0), ("g1", 2.0), ("g1", 3.0)).toDF("g", "x")
    val model = Disynth.fit(df, Seq("x"), Seq("g"))
    val resp = ExTuNe.tupleResponsibility(model, Map("g" -> Some("g9")), Array(2.0))
    assert(resp.forall(_ == 0.0))
  }

  test("explainDrift returns the drift score plus top attributes") {
    val rnd = new scala.util.Random(5)
    val train = (1 to 400).map(_ => (rnd.nextGaussian(), rnd.nextGaussian())).toDF("a", "b")
    val model = Disynth.fit(train, Seq("a", "b"))
    val test = (1 to 80).map(_ => (12.0 + rnd.nextGaussian(), rnd.nextGaussian())).toDF("a", "b")
    val (drift, top) = ExTuNe.explainDrift(test, model, topK = 1)
    assert(drift > 0.1)
    assert(top.head._1 == "a")
  }

  test("aggregate rejects empty input") {
    val df = Seq.empty[(Double, Double)].toDF("a", "b")
    val model = Disynth.fit(train2d(), Seq("a", "b"))
    intercept[IllegalArgumentException](ExTuNe.aggregate(df, model))
  }
}
