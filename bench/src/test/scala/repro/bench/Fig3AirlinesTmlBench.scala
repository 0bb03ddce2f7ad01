package repro.bench

import repro.SparkSpec
import repro.exp.AirlinesTml

/** Reproduces the Figure 3 table (and the Figure 4 correlation) at bench
  * scale: 600k synthetic flights (the paper used 5.4M real ones).
  *
  * Paper numbers (Figure 3):
  * {{{
  *                  Train   Daytime  Overnight  Mixed
  * Avg violation   0.0002    0.0002     0.2768  0.0887
  * MAE              18.95     18.89      80.54   38.60
  * }}}
  */
class Fig3AirlinesTmlBench extends SparkSpec {

  private lazy val res = AirlinesTml.run(spark, nFlights = 600000, seed = 11)
  private lazy val by = res.rows.map(r => r.split -> r).toMap

  test("Figure 3: airlines TML table") {
    println("\n=== Figure 3 — airlines: avg invariant violation and MAE per split ===")
    println(f"${"split"}%-10s ${"avg_violation"}%14s ${"MAE"}%10s")
    res.rows.foreach(r => println(f"${r.split}%-10s ${r.avgViolation}%14.4f ${r.mae}%10.2f"))
    println(f"paper:     violation 0.0002 / 0.0002 / 0.2768 / 0.0887; MAE 18.95 / 18.89 / 80.54 / 38.60")
    println(f"Figure 4:  PCC(violation, |error|) on Mixed sample = ${res.pcc}%.3f\n")

    // Shape assertions mirroring the paper's table.
    assert(by("Train").avgViolation < 0.01)
    assert(by("Daytime").avgViolation < 0.01)
    assert(by("Overnight").avgViolation > 0.1)
    assert(by("Mixed").avgViolation > by("Daytime").avgViolation)
    assert(by("Mixed").avgViolation < by("Overnight").avgViolation)
    assert(by("Overnight").mae > 2.5 * by("Daytime").mae)
    assert(math.abs(by("Train").mae - by("Daytime").mae) < 0.3 * by("Train").mae)
    assert(res.pcc > 0.6)
  }
}
