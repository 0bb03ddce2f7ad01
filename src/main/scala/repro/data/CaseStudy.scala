package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic populations for the §6.3 explanation case studies (substitutes
  * for the Kaggle Cardiovascular-Disease, Mobile-Price, and House-Price
  * datasets).
  *
  * Each generator produces a "reference" and a "shifted" population whose
  * differences plant the cause structure the paper reports:
  *  - cardio: blood-pressure attributes (`ap_hi`, `ap_lo`) are the
  *    distinguishing cause (and stay mutually correlated), other attributes
  *    shift only mildly (inside the ±4σ envelope)
  *  - mobile: `ram` is the single dominant cause
  *  - house: *every* attribute shifts past the envelope — the "holistic"
  *    pattern
  */
object CaseStudy {

  val CardioCols: Seq[String] = Seq("age", "height", "weight", "ap_hi", "ap_lo", "cholesterol", "gluc")
  val MobileCols: Seq[String] =
    Seq("ram", "battery_power", "px_height", "px_width", "int_memory", "mobile_wt", "talk_time")
  val HouseCols: Seq[String] =
    Seq("lot_area", "bsmt_area", "living_area", "bathrooms", "bedrooms", "garage_cars", "year_built")

  /** Cardiovascular patients. Healthy: ap_hi ~ N(120, 8) with ap_lo tied to
    * it; diseased: hypertensive ap_hi ~ N(165, 15). Cholesterol shifts only
    * ~1.5σ (stays inside the invariant envelope).
    */
  def cardio(spark: SparkSession, n: Long, diseased: Boolean, seed: Long = 41): DataFrame = {
    val apHi = if (diseased) randn(seed + 3) * 15 + 165 else randn(seed + 3) * 8 + 120
    spark.range(n).select(
      (randn(seed) * 8 + (if (diseased) 55 else 48)).as("age"),
      (randn(seed + 1) * 8 + 168).as("height"),
      (randn(seed + 2) * 10 + 72).as("weight"),
      apHi.as("ap_hi"),
      (apHi * 0.65 + randn(seed + 4) * 4).as("ap_lo"),
      (randn(seed + 5) * 25 + (if (diseased) 235 else 200)).as("cholesterol"),
      (randn(seed + 6) * 10 + 95).as("gluc"),
    )
  }

  /** Mobile phones. Expensive phones differ dominantly in RAM (~10σ shift);
    * battery shifts ~1σ (inside the envelope); the rest are identical.
    */
  def mobile(spark: SparkSession, n: Long, expensive: Boolean, seed: Long = 43): DataFrame =
    spark.range(n).select(
      (randn(seed) * 300 + (if (expensive) 3800 else 800)).as("ram"),
      (randn(seed + 1) * 400 + (if (expensive) 1600 else 1200)).as("battery_power"),
      (randn(seed + 2) * 300 + 900).as("px_height"),
      (randn(seed + 3) * 250 + 1100).as("px_width"),
      (randn(seed + 4) * 15 + 32).as("int_memory"),
      (randn(seed + 5) * 25 + 140).as("mobile_wt"),
      (randn(seed + 6) * 4 + 11).as("talk_time"),
    )

  /** Houses. Expensive houses shift on *every* attribute by ~5σ — the cause
    * is holistic, no single attribute explains non-conformance.
    */
  def house(spark: SparkSession, n: Long, expensive: Boolean, seed: Long = 47): DataFrame = {
    val b = if (expensive) 1.0 else 0.0
    spark.range(n).select(
      (randn(seed) * 1500 + 8000 + b * 7500).as("lot_area"),
      (randn(seed + 1) * 250 + 900 + b * 1200).as("bsmt_area"),
      (randn(seed + 2) * 300 + 1300 + b * 1500).as("living_area"),
      (randn(seed + 3) * 0.5 + 1.5 + b * 2.5).as("bathrooms"),
      (randn(seed + 4) * 0.7 + 2.8 + b * 3.4).as("bedrooms"),
      (randn(seed + 5) * 0.5 + 1.0 + b * 2.4).as("garage_cars"),
      (randn(seed + 6) * 12 + 1955 + b * 55).as("year_built"),
    )
  }
}
