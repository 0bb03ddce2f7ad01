package repro.jobs

import repro.exp.AirlinesTml

/** Reproduces the Figure 3 table (airlines TML: avg violation + MAE per
  * split) and the Figure 4 correlation. Usage:
  * `spark-submit --class repro.jobs.AirlinesTmlJob <jar> [nFlights]`
  */
object AirlinesTmlJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toLong).getOrElse(600000L)
    val spark = JobSession.get("airlines-tml")
    val res = AirlinesTml.run(spark, n)
    println(f"${"split"}%-10s ${"avg_violation"}%14s ${"MAE"}%10s")
    res.rows.foreach(r => println(f"${r.split}%-10s ${r.avgViolation}%14.4f ${r.mae}%10.2f"))
    println(f"PCC(violation, |error|) on Mixed sample: ${res.pcc}%.3f")
    spark.stop()
  }
}
