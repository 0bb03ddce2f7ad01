package repro.bench

import repro.SparkSpec
import repro.data.Evl
import repro.exp.EvlDrift

/** Reproduces the Figure 8 data: drift quantification across the EVL
  * benchmark for DISYNTH, PCA-SPLL, CD-MKL, CD-Area.
  *
  * Paper shape: DISYNTH matches the ground-truth drift on every stream;
  * PCA-SPLL matches on global drift but misses local drift (4CR, 4CRE-V2,
  * FG-2C-2D); CD detects but cannot quantify (saturates / noisy), with
  * CD-Area better than CD-MKL.
  */
class Fig8EvlBench extends SparkSpec {

  private lazy val results = EvlDrift.run(spark, nWindows = 10, pointsPerClass = 500)

  test("Figure 8: EVL drift curves and correlation with ground truth") {
    println("\n=== Figure 8 — EVL drift quantification (normalized curves) ===")
    results.foreach { r =>
      println(s"-- ${r.dataset} --")
      println("  window  " + (1 to 10).map(i => f"$i%6d").mkString)
      println("  gt      " + r.groundTruth.map(v => f"$v%6.2f").mkString)
      EvlDrift.Methods.foreach { m =>
        println(f"  $m%-8s" + r.curves(m).map(v => f"$v%6.2f").mkString + f"  corr=${r.corr(m)}%6.3f")
      }
    }
    println("\ncorrelation-with-ground-truth summary:")
    println(f"${"dataset"}%-10s" + EvlDrift.Methods.map(m => f"$m%10s").mkString)
    results.foreach { r =>
      println(f"${r.dataset}%-10s" + EvlDrift.Methods.map(m => f"${r.corr(m)}%10.3f").mkString)
    }
    println("paper: DISYNTH tracks gt everywhere; PCA-SPLL fails on " +
      "4CR/4CRE-V2/FG-2C-2D; CD noisy/saturating\n")

    // DISYNTH quantifies every stream.
    results.foreach(r => assert(r.corr("DISYNTH") > 0.75, s"${r.dataset}: ${r.corr("DISYNTH")}"))
    // Never far behind a baseline on any single stream...
    results.foreach { r =>
      EvlDrift.Methods.filterNot(_ == "DISYNTH").foreach { m =>
        assert(r.corr("DISYNTH") >= r.corr(m) - 0.15, s"${r.dataset}: DISYNTH vs $m")
      }
    }
    // ...and the robustness claim that is the paper's actual point: every
    // baseline collapses on *some* stream, DISYNTH on none — its worst-case
    // correlation beats every baseline's worst case by a wide margin.
    def worst(m: String): Double = results.map(_.corr(m)).min
    EvlDrift.Methods.filterNot(_ == "DISYNTH").foreach { m =>
      assert(worst("DISYNTH") > worst(m) + 0.3, s"worst-case DISYNTH ${worst("DISYNTH")} vs $m ${worst(m)}")
    }
  }

  test("Figure 8: PCA-SPLL misses local drift but tracks global drift") {
    val by = results.map(r => r.dataset -> r).toMap
    Evl.LocalDriftDatasets.foreach { d =>
      assert(by(d).corr("PCA-SPLL") < 0.6, s"$d: PCA-SPLL ${by(d).corr("PCA-SPLL")}")
      assert(by(d).corr("DISYNTH") > by(d).corr("PCA-SPLL") + 0.25, s"$d: no DISYNTH margin")
    }
    val globalSets = Seq("1CDT", "2CDT", "1CHT", "2CHT", "5CVT")
    globalSets.foreach { d =>
      assert(by(d).corr("PCA-SPLL") > 0.7, s"$d: PCA-SPLL ${by(d).corr("PCA-SPLL")}")
    }
  }

  test("Figure 8: CD saturates on large translations (detects, cannot quantify)") {
    val by = results.map(r => r.dataset -> r).toMap
    // On a long translation the Area curve hits ≈1 early and stays there.
    val curve = by("2CHT").curves("CD-Area")
    val lateSpread = curve.drop(5).max - curve.drop(5).min
    assert(lateSpread < 0.35, s"CD-Area still discriminating late: $curve")
  }
}
