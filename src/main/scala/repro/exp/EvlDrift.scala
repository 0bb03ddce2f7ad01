package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.Disynth
import repro.data.Evl
import repro.drift.{ChangeDetection, PcaSpll}
import repro.stats.Stats

/** Fig. 8: drift quantification on the EVL benchmark — DISYNTH vs PCA-SPLL,
  * CD-MKL, and CD-Area, scored against the analytic ground-truth drift.
  */
object EvlDrift {

  val Methods: Seq[String] = Seq("DISYNTH", "PCA-SPLL", "CD-MKL", "CD-Area")

  /** Per-dataset drift curves (min-max normalized, as in the paper's plots)
    * and each method's Pearson correlation with the ground truth.
    */
  final case class DatasetResult(
      dataset: String,
      groundTruth: Seq[Double],
      curves: Map[String, Seq[Double]],
      corr: Map[String, Double],
  )

  def run(
      spark: SparkSession,
      datasets: Seq[String] = Evl.Datasets,
      nWindows: Int = 10,
      pointsPerClass: Int = 300,
      seed: Long = 23,
  ): Seq[DatasetResult] = datasets.map { name =>
    val w1 = Evl.window(spark, name, 1, nWindows, pointsPerClass, seed).cache()
    try {
      val xy = Seq("x", "y")
      val dis = Disynth.fit(w1, xy, Seq("cls"))
      val spll = PcaSpll.fit(w1, xy)
      val cd = ChangeDetection.fit(w1, xy)

      val raw = (1 to nWindows).map { w =>
        val dw = Evl.window(spark, name, w, nWindows, pointsPerClass, seed + 7777).cache()
        try {
          (
            Disynth.avgViolation(dw, dis),
            PcaSpll.drift(dw, spll),
            ChangeDetection.drift(dw, cd, ChangeDetection.MKL),
            ChangeDetection.drift(dw, cd, ChangeDetection.Area),
          )
        } finally dw.unpersist()
      }

      val gtRaw = (1 to nWindows).map(w => Evl.groundTruth(name, w, nWindows))
      val gt = Stats.minMaxNormalize(gtRaw)
      val curves = Map(
        "DISYNTH" -> Stats.minMaxNormalize(raw.map(_._1)),
        "PCA-SPLL" -> Stats.minMaxNormalize(raw.map(_._2)),
        "CD-MKL" -> Stats.minMaxNormalize(raw.map(_._3)),
        "CD-Area" -> Stats.minMaxNormalize(raw.map(_._4)),
      )
      val corr = curves.map { case (m, c) => m -> Stats.pearson(gtRaw, c) }
      DatasetResult(name, gt, curves, corr)
    } finally w1.unpersist()
  }
}
