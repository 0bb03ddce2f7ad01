package repro.jobs

import repro.exp.EvlDrift

/** Reproduces the Figure 8 data: normalized drift curves per EVL dataset
  * for DISYNTH, PCA-SPLL, CD-MKL, CD-Area, plus each method's correlation
  * with the ground-truth drift.
  */
object EvlDriftJob {
  def main(args: Array[String]): Unit = {
    val points = args.headOption.map(_.toInt).getOrElse(500)
    val spark = JobSession.get("evl-drift")
    val results = EvlDrift.run(spark, pointsPerClass = points)
    results.foreach { r =>
      println(s"== ${r.dataset} ==")
      println("  window:    " + r.groundTruth.indices.map(i => f"${i + 1}%6d").mkString)
      println("  gt:        " + r.groundTruth.map(v => f"$v%6.2f").mkString)
      EvlDrift.Methods.foreach { m =>
        println(f"  $m%-9s " + r.curves(m).map(v => f"$v%6.2f").mkString + f"   corr=${r.corr(m)}%6.3f")
      }
    }
    println("\nPearson correlation with ground truth:")
    println((f"${"dataset"}%-10s" + EvlDrift.Methods.map(m => f"$m%10s").mkString))
    results.foreach { r =>
      println(f"${r.dataset}%-10s" + EvlDrift.Methods.map(m => f"${r.corr(m)}%10.3f").mkString)
    }
    spark.stop()
  }
}
