package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.Disynth
import repro.data.Led
import repro.explain.ExTuNe

/** Fig. 10(d): drift and per-attribute responsibility over 20 LED windows.
  *
  * Invariants (disjunctive on `digit`) are learned on window 1; every window
  * reports its drift score and the ExTuNe responsibility of each attribute,
  * which should localize exactly the malfunctioning LEDs of the schedule.
  */
object LedExplain {

  final case class WindowResult(
      window: Int,
      drift: Double,
      responsibilities: Seq[(String, Double)],
      expectedLeds: Seq[Int],
  )

  def run(
      spark: SparkSession,
      nWindows: Int = 20,
      rowsPerWindow: Int = 5000,
      respSample: Int = 150,
      seed: Long = 31,
  ): Seq[WindowResult] = {
    val w1 = Led.window(spark, 1, rowsPerWindow, seed).cache()
    val model =
      try Disynth.fit(w1, Led.FeatureCols, Seq("digit"))
      finally w1.unpersist()

    (1 to nWindows).map { w =>
      val dw = Led.window(spark, w, rowsPerWindow, seed).cache()
      try {
        val drift = Disynth.avgViolation(dw, model)
        val resp = ExTuNe.aggregate(dw, model, maxTuples = respSample)
        WindowResult(w, drift, resp.sortBy(-_._2), Led.malfunctioningLeds(w))
      } finally dw.unpersist()
    }
  }
}
