package repro.bench

import repro.SparkSpec
import repro.data.Led
import repro.exp.{CaseStudies, LedExplain}

/** Reproduces the Figure 10(a–c) data: ExTuNe attribute responsibilities on
  * the three case-study populations.
  *
  * Paper shape: (a) Cardio — blood pressures (ap_hi/ap_lo) dominate;
  * (b) Mobile — RAM dominates; (c) House — responsibilities spread
  * holistically across attributes.
  */
class Fig10CaseStudyBench extends SparkSpec {

  test("Figure 10(a–c): case-study responsibilities") {
    val studies = CaseStudies.run(spark, n = 20000, respSample = 200)
    println("\n=== Figure 10(a–c) — ExTuNe responsibilities ===")
    studies.foreach { s =>
      println(s"-- ${s.study} --")
      s.responsibilities.foreach { case (a, v) => println(f"  $a%-15s $v%6.3f") }
    }
    println("paper shape: Cardio→blood pressure, Mobile→RAM, House→holistic\n")

    val by = studies.map(s => s.study -> s.responsibilities).toMap
    assert(by("Cardio").take(2).map(_._1).toSet == Set("ap_hi", "ap_lo"))
    assert(by("MobilePrice").head._1 == "ram")
    assert(by("MobilePrice").head._2 > by("MobilePrice")(1)._2 + 0.2)
    val houseVals = by("HousePrice").map(_._2)
    assert(houseVals.max < 0.45 && houseVals.max - houseVals.min < 0.25,
      s"house not holistic: ${by("HousePrice")}")
  }
}

/** Reproduces the Figure 10(d) data: LED stream drift every 5 windows with
  * responsibility localizing the malfunctioning LEDs.
  *
  * Paper: windows 1–5 no drift; 6–10 LEDs 4&5; 11–15 LEDs 1&3; 16–20 the
  * next scheduled pair.
  */
class Fig10dLedBench extends SparkSpec {

  test("Figure 10(d): LED drift and responsible LEDs per window") {
    val results = LedExplain.run(spark, nWindows = 20, rowsPerWindow = 5000, respSample = 100)
    println("\n=== Figure 10(d) — LED drift + top responsibilities ===")
    println(f"${"win"}%4s ${"drift"}%8s ${"expected"}%10s  top-3 responsibilities")
    results.foreach { r =>
      val top = r.responsibilities.take(3).map { case (a, v) => f"$a=$v%.2f" }.mkString(", ")
      println(f"${r.window}%4d ${r.drift}%8.4f ${r.expectedLeds.mkString("{", ",", "}")}%10s  $top")
    }
    println("paper: no drift in 1–5; each later 5-window block blames its malfunctioning LEDs\n")

    val byW = results.map(r => r.window -> r).toMap
    val cleanMax = (1 to 5).map(w => byW(w).drift).max
    (6 to 20).foreach(w => assert(byW(w).drift > 3 * cleanMax + 0.02, s"window $w"))
    (6 to 20).foreach { w =>
      val expected = Led.malfunctioningLeds(w).map(i => s"led$i").toSet
      val top2 = byW(w).responsibilities.take(2).map(_._1).toSet
      assert(top2 == expected, s"window $w: top2 $top2, expected $expected")
    }
  }
}
