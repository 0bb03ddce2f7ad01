package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType

/** Synthetic Human Activity Recognition dataset (substitute for Sztyler &
  * Stuckenschmidt's on-body sensor data, §6.1).
  *
  * 15 persons × 5 activities × 36 numeric attributes (2 sensors × 6 body
  * locations × 3 axes). The generative structure plants exactly the
  * relationships the paper's HAR experiments key on:
  *
  *  - each activity has a latent intensity `pos` and noise level `σ`:
  *    sedentary activities (lying/sitting/standing) are tight clusters at
  *    well-separated intensities; mobile activities (walking/running) have
  *    large σ whose ±4σ envelope *covers* the sedentary range — the
  *    "safety envelope" asymmetry behind Fig. 7 (while a person walks, she
  *    also briefly stands; the opposite does not happen)
  *  - each person adds a per-attribute offset, scaled up for the three
  *    "outlier" persons (p3, p8, p15 — low fitness / high BMI in the
  *    metadata), producing the Fig. 6 inter-person structure
  *  - two shared latent factors per tuple induce cross-attribute
  *    correlations, so PCA finds genuinely low-variance *combinations*,
  *    not just per-attribute ranges
  */
object Har {

  val Activities: Seq[String] = Seq("lying", "sitting", "standing", "walking", "running")
  val Sedentary: Seq[String] = Seq("lying", "sitting", "standing")
  val Mobile: Seq[String] = Seq("walking", "running")
  val Persons: Seq[String] = (1 to 15).map(i => s"p$i")

  /** The 36 sensor attributes: sensor × body location × axis. */
  val FeatureCols: Seq[String] =
    for {
      sensor <- Seq("acc", "gyr")
      loc <- Seq("head", "shin", "thigh", "upperarm", "waist", "chest")
      axis <- Seq("x", "y", "z")
    } yield s"${sensor}_${loc}_$axis"

  /** Activity latent intensity (cluster center scale). */
  private val ActivityPos: Map[String, Double] =
    Map("lying" -> 0.0, "sitting" -> 6.0, "standing" -> 12.0, "walking" -> 6.0, "running" -> 14.0)

  /** Activity noise level; mobile σ is large enough that ±4σ covers the
    * sedentary intensity range.
    */
  private val ActivitySigma: Map[String, Double] =
    Map("lying" -> 0.3, "sitting" -> 0.3, "standing" -> 0.3, "walking" -> 3.5, "running" -> 6.0)

  /** Persons with amplified offsets (the fitness/BMI outliers of Fig. 6). */
  private val OutlierPersons: Set[Int] = Set(3, 8, 15)

  /** Hidden ground-truth metadata displayed next to Fig. 6 in the paper. */
  val PersonMeta: Seq[(String, String, String, String)] = Persons.zipWithIndex.map {
    case (p, i) =>
      val idx = i + 1
      if (OutlierPersons.contains(idx)) (p, "Low", "Obese", if (idx % 2 == 0) "Female" else "Male")
      else (p, if (idx % 3 == 0) "High" else "Moderate", "Normal", if (idx % 2 == 0) "Male" else "Female")
  }

  // Deterministic per-attribute parameters: loading on the activity
  // intensity, loadings on the two shared latent factors, and the 15-person
  // offset table.
  private case class AttrParams(load: Double, a1: Double, a2: Double, offsets: Array[Double])

  private lazy val attrParams: Seq[AttrParams] = {
    val rng = new scala.util.Random(42)
    FeatureCols.map { _ =>
      val load = 0.6 + rng.nextDouble() * 0.8
      val a1 = rng.nextDouble() * 2 - 1
      val a2 = rng.nextDouble() * 2 - 1
      val offsets = Array.tabulate(Persons.length) { p =>
        val scale = if (OutlierPersons.contains(p + 1)) 2.0 else 1.0
        rng.nextGaussian() * scale
      }
      AttrParams(load, a1, a2, offsets)
    }
  }

  /** Generate `rowsPerPersonActivity` tuples for every (person, activity)
    * pair. Columns: `person`, `activity`, `rid` (within-pair row index, for
    * deterministic half splits), and the 36 [[FeatureCols]].
    */
  def data(spark: SparkSession, rowsPerPersonActivity: Int, seed: Long = 7): DataFrame = {
    val nP = Persons.length
    val nA = Activities.length
    val rpa = rowsPerPersonActivity.toLong
    val total = nP * nA * rpa

    val base = spark.range(total)
      .withColumn("pIdx", (col("id") / (nA * rpa)).cast(IntegerType))
      .withColumn("aIdx", ((col("id") % (nA * rpa)) / rpa).cast(IntegerType))
      .withColumn("rid", (col("id") % rpa).cast(IntegerType))
      .withColumn("z1", randn(seed))
      .withColumn("z2", randn(seed + 1))

    val personCol = element_at(array(Persons.map(lit): _*), col("pIdx") + 1).as("person")
    val activityCol = element_at(array(Activities.map(lit): _*), col("aIdx") + 1).as("activity")
    val posCol = element_at(array(Activities.map(a => lit(ActivityPos(a))): _*), col("aIdx") + 1)
    val sigCol = element_at(array(Activities.map(a => lit(ActivitySigma(a))): _*), col("aIdx") + 1)

    val featureExprs: Seq[Column] = FeatureCols.zipWithIndex.map { case (name, ai) =>
      val p = attrParams(ai)
      val offset = element_at(array(p.offsets.toIndexedSeq.map(lit): _*), col("pIdx") + 1)
      // Activity noise scales with the same loading as the activity
      // intensity: the per-attribute separation between activity means is
      // then a *fixed multiple* of the activity σ, so the mobile ±4σ
      // envelope covers the sedentary means on every attribute (the
      // independent-noise floor 0.6 keeps the multiple below 4).
      (lit(p.load) * (posCol +
        sigCol * (lit(p.a1) * col("z1") + lit(p.a2) * col("z2") + lit(0.6) * randn(seed + 10 + ai))) +
        offset
      ).as(name)
    }

    base.select(personCol +: activityCol +: col("rid") +: featureExprs: _*)
  }

  /** Even-`rid` half — used as training data. */
  def trainHalf(df: DataFrame): DataFrame = df.filter(col("rid") % 2 === 0)

  /** Odd-`rid` half — used as held-out data. */
  def holdHalf(df: DataFrame): DataFrame = df.filter(col("rid") % 2 === 1)
}
