package repro.exp

import repro.SparkSpec
import repro.data.Led

/** Small-scale integration runs of the Figure 10 experiments. */
class ExplainExperimentsSpec extends SparkSpec {

  test("LED (Fig 10d): clean windows show no drift, drifted windows blame the right LEDs") {
    val results = LedExplain.run(spark, nWindows = 12, rowsPerWindow = 1200, respSample = 60)
    val byW = results.map(r => r.window -> r).toMap

    // Windows 1–5: no malfunction, negligible drift.
    val cleanMax = (1 to 5).map(w => byW(w).drift).max
    assert(cleanMax < 0.05, s"clean drift $cleanMax")
    // Windows 6–10: LEDs 4 and 5 malfunction — drift jumps well clear of
    // the clean level...
    (6 to 10).foreach(w =>
      assert(byW(w).drift > 3 * cleanMax + 0.02, s"window $w drift ${byW(w).drift} vs clean $cleanMax"))
    // ...and the top-2 responsibilities are exactly led4 and led5.
    (6 to 10).foreach { w =>
      val top2 = byW(w).responsibilities.take(2).map(_._1).toSet
      assert(top2 == Set("led4", "led5"), s"window $w top2 $top2")
    }
    // Windows 11–12: the malfunction moves to LEDs 1 and 3.
    (11 to 12).foreach { w =>
      val top2 = byW(w).responsibilities.take(2).map(_._1).toSet
      assert(top2 == Set("led1", "led3"), s"window $w top2 $top2")
    }
  }

  test("LED: irrelevant attributes never outrank a malfunctioning segment") {
    val results = LedExplain.run(spark, nWindows = 7, rowsPerWindow = 1200, respSample = 50)
    val w6 = results.find(_.window == 6).get
    val respMap = w6.responsibilities.toMap
    val worstIrr = Led.IrrelevantCols.map(respMap).max
    assert(respMap("led4") > worstIrr && respMap("led5") > worstIrr)
  }

  test("case studies (Fig 10a–c): planted causes are ranked first") {
    val studies = CaseStudies.run(spark, n = 3000, respSample = 80).map(s => s.study -> s).toMap

    // Cardio: blood-pressure attributes dominate.
    val cardioTop2 = studies("Cardio").responsibilities.take(2).map(_._1).toSet
    assert(cardioTop2 == Set("ap_hi", "ap_lo"), s"cardio top2 $cardioTop2")

    // Mobile: RAM is the single distinguishing factor.
    val mobile = studies("MobilePrice").responsibilities
    assert(mobile.head._1 == "ram", s"mobile top ${mobile.head}")
    assert(mobile.head._2 > mobile(1)._2 + 0.2, s"ram does not dominate: $mobile")

    // House: holistic — responsibilities are low and flat, no dominant attr.
    val house = studies("HousePrice").responsibilities
    val vals = house.map(_._2)
    assert(vals.max < 0.45, s"house has a dominant attribute: $house")
    assert(vals.max - vals.min < 0.25, s"house responsibilities not flat: $house")
  }
}
