package repro.jobs

import repro.exp.HarExperiments

/** Reproduces the Figure 5(a) data: avg violation and classifier accuracy
  * drop as the mobile-activity fraction grows.
  */
object HarMixJob {
  def main(args: Array[String]): Unit = {
    val rpa = args.headOption.map(_.toInt).getOrElse(300)
    val spark = JobSession.get("har-mix")
    val res = HarExperiments.mixCurve(spark, rpa)
    println(f"${"mobile_frac"}%12s ${"avg_violation"}%14s ${"acc_drop"}%10s")
    res.points.foreach(p => println(f"${p.mobileFraction}%12.1f ${p.avgViolation}%14.4f ${p.accuracyDrop}%10.4f"))
    println(f"PCC(violation, accuracy drop): ${res.pcc}%.3f")
    spark.stop()
  }
}

/** Reproduces the Figure 5(b) data: gradual local drift, DISYNTH vs W-PCA. */
object GradualDriftJob {
  def main(args: Array[String]): Unit = {
    val rpa = args.headOption.map(_.toInt).getOrElse(200)
    val spark = JobSession.get("har-gradual-drift")
    val points = HarExperiments.gradualDrift(spark, rpa)
    println(f"${"K"}%3s ${"DISYNTH"}%10s ${"W-PCA"}%10s")
    points.foreach(p => println(f"${p.k}%3d ${p.disynth}%10.4f ${p.wpca}%10.4f"))
    spark.stop()
  }
}

/** Reproduces the Figure 6 (inter-person) and Figure 7 (inter-activity)
  * violation heat-map tables.
  */
object HarHeatmapsJob {
  def main(args: Array[String]): Unit = {
    val rpa = args.headOption.map(_.toInt).getOrElse(200)
    val spark = JobSession.get("har-heatmaps")

    val (persons, pm) = HarExperiments.interPerson(spark, rpa)
    println("Figure 6 — inter-person violation (row = model, column = data):")
    println(JobSession.matrix(persons, persons, (i, j) => pm(i, j)))

    val (acts, am) = HarExperiments.interActivity(spark, rpa)
    println("\nFigure 7 — inter-activity violation (row = model, column = data):")
    println(JobSession.matrix(acts, acts, (i, j) => am(i, j)))
    spark.stop()
  }
}
