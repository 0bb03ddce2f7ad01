package repro.bench

import repro.SparkSpec
import repro.exp.HarExperiments

/** Reproduces the Figure 5(a) data: avg violation vs classifier accuracy
  * drop as mobile-activity data is mixed into a sedentary test set.
  *
  * Paper: both curves rise together; pcc = 0.99 (p ≈ 0).
  */
class Fig5aHarMixBench extends SparkSpec {

  test("Figure 5(a): HAR mixture curve") {
    val res = HarExperiments.mixCurve(spark, rowsPerPersonActivity = 400,
      fractions = Seq(0.0, 0.2, 0.4, 0.6, 0.8, 1.0))
    println("\n=== Figure 5(a) — HAR: violation vs accuracy drop by mobile fraction ===")
    println(f"${"mobile_frac"}%12s ${"avg_violation"}%14s ${"acc_drop"}%10s")
    res.points.foreach(p =>
      println(f"${p.mobileFraction}%12.1f ${p.avgViolation}%14.4f ${p.accuracyDrop}%10.4f"))
    println(f"PCC(violation, accuracy drop) = ${res.pcc}%.3f   (paper: 0.99)\n")

    val v = res.points.map(_.avgViolation)
    val d = res.points.map(_.accuracyDrop)
    assert(v.zip(v.tail).forall { case (a, b) => a < b })
    assert(d.zip(d.tail).forall { case (a, b) => a < b })
    assert(res.pcc > 0.95)
  }
}

/** Reproduces the Figure 5(b) data: gradual local drift as persons switch
  * activities one at a time — DISYNTH (disjunctive) vs W-PCA (global).
  *
  * Paper: DISYNTH's violation rises steadily with K (to ≈0.45 at K=15);
  * W-PCA stays flat because the global mixture never changes.
  */
class Fig5bGradualDriftBench extends SparkSpec {

  test("Figure 5(b): gradual drift, DISYNTH vs W-PCA") {
    val pts = HarExperiments.gradualDrift(spark, rowsPerPersonActivity = 400)
    println("\n=== Figure 5(b) — HAR gradual drift (K persons switched) ===")
    println(f"${"K"}%3s ${"DISYNTH"}%10s ${"W-PCA"}%10s")
    pts.foreach(p => println(f"${p.k}%3d ${p.disynth}%10.4f ${p.wpca}%10.4f"))
    println("paper: DISYNTH rises ~linearly to ≈0.45; W-PCA flat ≈0\n")

    val dis = pts.map(_.disynth); val wp = pts.map(_.wpca)
    assert(dis.head < 0.05 && dis.last > 0.25)
    assert(dis.zip(dis.tail).forall { case (a, b) => b >= a - 0.02 })
    assert(wp.max - wp.min < 0.05)
    assert(dis.last > 4 * wp.last + 0.1)
  }
}
