package repro.exp

import repro.SparkSpec

/** Small-scale (SF≈0.01) integration run of the Figure 3/4 experiment. */
class AirlinesTmlSpec extends SparkSpec {

  private lazy val res = AirlinesTml.run(spark, nFlights = 20000, seed = 11)
  private lazy val bySplit = res.rows.map(r => r.split -> r).toMap

  test("produces the four Figure 3 rows") {
    assert(res.rows.map(_.split) == Seq("Train", "Daytime", "Overnight", "Mixed"))
  }

  test("train and daytime violations are near zero") {
    assert(bySplit("Train").avgViolation < 0.02, s"train ${bySplit("Train").avgViolation}")
    assert(bySplit("Daytime").avgViolation < 0.02, s"daytime ${bySplit("Daytime").avgViolation}")
  }

  test("overnight violation dwarfs daytime violation (the paper's key contrast)") {
    assert(bySplit("Overnight").avgViolation > 10 * bySplit("Daytime").avgViolation + 0.05,
      s"overnight ${bySplit("Overnight").avgViolation} vs daytime ${bySplit("Daytime").avgViolation}")
  }

  test("mixed violation sits between daytime and overnight, near a third of overnight") {
    val m = bySplit("Mixed").avgViolation
    assert(m > bySplit("Daytime").avgViolation && m < bySplit("Overnight").avgViolation)
    assert(m > 0.15 * bySplit("Overnight").avgViolation && m < 0.6 * bySplit("Overnight").avgViolation)
  }

  test("MAE degrades sharply on overnight flights (regression trusted the invariant)") {
    assert(bySplit("Overnight").mae > 2.5 * bySplit("Daytime").mae,
      s"overnight MAE ${bySplit("Overnight").mae} vs daytime ${bySplit("Daytime").mae}")
  }

  test("train and daytime MAE are comparable (no overfitting artifact)") {
    val ratio = bySplit("Daytime").mae / bySplit("Train").mae
    assert(ratio > 0.8 && ratio < 1.3, s"ratio $ratio")
  }

  test("violation correlates with absolute prediction error on mixed tuples (Figure 4)") {
    assert(res.pcc > 0.6, s"pcc ${res.pcc}")
  }
}
