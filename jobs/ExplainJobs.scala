package repro.jobs

import repro.exp.{CaseStudies, LedExplain}

/** Reproduces the Figure 10(d) data: LED drift per window and which LEDs
  * carry the responsibility.
  */
object LedExplainJob {
  def main(args: Array[String]): Unit = {
    val rows = args.headOption.map(_.toInt).getOrElse(5000)
    val spark = JobSession.get("led-explain")
    val results = LedExplain.run(spark, rowsPerWindow = rows)
    println(f"${"win"}%4s ${"drift"}%8s ${"expected"}%12s  top responsibilities")
    results.foreach { r =>
      val top = r.responsibilities.take(3).map { case (a, v) => f"$a=$v%.2f" }.mkString(", ")
      println(f"${r.window}%4d ${r.drift}%8.4f ${r.expectedLeds.mkString("{", ",", "}")}%12s  $top")
    }
    spark.stop()
  }
}

/** Reproduces the Figure 10(a–c) data: attribute responsibilities for the
  * Cardio / Mobile-Price / House-Price case studies.
  */
object CaseStudiesJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toLong).getOrElse(20000L)
    val spark = JobSession.get("case-studies")
    CaseStudies.run(spark, n).foreach { s =>
      println(s"== ${s.study} ==")
      s.responsibilities.foreach { case (a, v) => println(f"  $a%-15s $v%6.3f") }
    }
    spark.stop()
  }
}
