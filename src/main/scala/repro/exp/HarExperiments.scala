package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Disynth
import repro.data.Har
import repro.drift.WeightedPca
import repro.linalg.Mat
import repro.ml.LogisticRegression
import repro.stats.Stats

/** The three HAR experiments: the mixture curve of Fig. 5(a), the gradual-
  * drift comparison of Fig. 5(b), and the inter-person / inter-activity
  * violation heat maps of Figs. 6 and 7.
  */
object HarExperiments {

  /** One point of the Fig. 5(a) curve. */
  final case class MixPoint(mobileFraction: Double, avgViolation: Double, accuracyDrop: Double)

  final case class MixResult(points: Seq[MixPoint], pcc: Double)

  /** Fig. 5(a): invariants + person classifier trained on sedentary data;
    * test sets mix in a growing fraction of mobile-activity data.
    */
  def mixCurve(
      spark: SparkSession,
      rowsPerPersonActivity: Int = 120,
      fractions: Seq[Double] = Seq(0.0, 0.2, 0.4, 0.6, 0.8, 1.0),
      seed: Long = 7,
  ): MixResult = {
    val all = Har.data(spark, rowsPerPersonActivity, seed).cache()
    try {
      val sedentary = all.filter(col("activity").isin(Har.Sedentary: _*))
      val mobile = all.filter(col("activity").isin(Har.Mobile: _*)).cache()
      val trainX = Har.trainHalf(sedentary).cache()
      val holdSed = Har.holdHalf(sedentary).cache()

      val inv = Disynth.fit(trainX, Har.FeatureCols, Seq("activity"))
      val clf = LogisticRegression.fit(trainX, Har.FeatureCols, "person")
      val baseAcc = clf.accuracy(holdSed, "person")

      val nSed = holdSed.count().toDouble
      val nMob = mobile.count().toDouble
      val testSize = math.min(nSed, nMob)

      val points = fractions.map { f =>
        val sedRate = math.min(1.0, (1 - f) * testSize / nSed)
        val mobRate = math.min(1.0, f * testSize / nMob)
        val test =
          holdSed.sample(withReplacement = false, sedRate, seed + (f * 100).toLong)
            .unionAll(mobile.sample(withReplacement = false, mobRate, seed + 1 + (f * 100).toLong))
        MixPoint(f, Disynth.avgViolation(test, inv), baseAcc - clf.accuracy(test, "person"))
      }
      val pcc = Stats.pearson(points.map(_.avgViolation), points.map(_.accuracyDrop))
      MixResult(points, pcc)
    } finally all.unpersist()
  }

  /** Activity each person performs initially (Fig. 5(b)): cyclic over an
    * order chosen so most — but not all — switches are detectable, like the
    * organic setup in the paper.
    */
  private val DriftCycle: Seq[String] = Seq("lying", "walking", "sitting", "running", "standing")

  private def initialActivity(personIdx: Int): String = DriftCycle(personIdx % 5)
  private def switchedActivity(personIdx: Int): String = DriftCycle((personIdx + 1) % 5)

  /** One point of the Fig. 5(b) curves. */
  final case class DriftPoint(k: Int, disynth: Double, wpca: Double)

  /** Fig. 5(b): persons switch activity one at a time (K = number switched);
    * DISYNTH uses per-person disjunctive invariants, W-PCA a single global
    * one. The global activity mixture is invariant under the cyclic switch,
    * so W-PCA stays flat while DISYNTH tracks the local drift.
    */
  def gradualDrift(
      spark: SparkSession,
      rowsPerPersonActivity: Int = 120,
      seed: Long = 7,
  ): Seq[DriftPoint] = {
    val all = Har.data(spark, rowsPerPersonActivity, seed).cache()
    try {
      def slice(personIdx: Int, activity: String, train: Boolean): DataFrame = {
        val base = all.filter(col("person") === Har.Persons(personIdx) && col("activity") === activity)
        if (train) Har.trainHalf(base) else Har.holdHalf(base)
      }
      val initialTrain = Har.Persons.indices.map(i => slice(i, initialActivity(i), train = true))
        .reduce(_ unionAll _).cache()

      val disModel = Disynth.fit(initialTrain, Har.FeatureCols, Seq("person"))
      val wpcaModel = WeightedPca.fit(initialTrain, Har.FeatureCols)

      (0 to Har.Persons.length).map { k =>
        val current = Har.Persons.indices.map { i =>
          val act = if (i < k) switchedActivity(i) else initialActivity(i)
          slice(i, act, train = false)
        }.reduce(_ unionAll _)
        DriftPoint(k, Disynth.avgViolation(current, disModel), WeightedPca.drift(current, wpcaModel))
      }
    } finally all.unpersist()
  }

  /** Fig. 6: for each person, fit disjunctive (per-activity) invariants on
    * half their data; score every person's held-out half, activity-wise.
    *
    * @return (person labels, matrix) where cell (i,j) is the violation of
    *         person j's data against person i's invariants
    */
  def interPerson(spark: SparkSession, rowsPerPersonActivity: Int = 120, seed: Long = 7,
                  persons: Seq[String] = Har.Persons): (Seq[String], Mat) = {
    val all = Har.data(spark, rowsPerPersonActivity, seed)
      .filter(col("person").isin(persons: _*)).cache()
    try {
      val hold = Har.holdHalf(all).cache()
      val m = Mat.zeros(persons.length, persons.length)
      persons.zipWithIndex.foreach { case (p, i) =>
        val model = Disynth.fit(
          Har.trainHalf(all.filter(col("person") === p)), Har.FeatureCols, Seq("activity"))
        val scored = Disynth.score(hold, model)
          .groupBy(col("person")).agg(avg(col("violation")).as("v"))
          .collect()
          .map(r => r.getString(0) -> r.getDouble(1)).toMap
        persons.zipWithIndex.foreach { case (q, j) => m(i, j) = scored(q) }
      }
      (persons, m)
    } finally all.unpersist()
  }

  /** Fig. 7: for each activity, fit invariants (disjunctive over person) on
    * half the data; score every activity's held-out half.
    *
    * @return (activity labels, matrix) where cell (i,j) is the violation of
    *         activity j's data against activity i's invariants
    */
  def interActivity(spark: SparkSession, rowsPerPersonActivity: Int = 120, seed: Long = 7)
      : (Seq[String], Mat) = {
    val all = Har.data(spark, rowsPerPersonActivity, seed).cache()
    try {
      val hold = Har.holdHalf(all).cache()
      val acts = Har.Activities
      val m = Mat.zeros(acts.length, acts.length)
      acts.zipWithIndex.foreach { case (a, i) =>
        val model = Disynth.fit(
          Har.trainHalf(all.filter(col("activity") === a)), Har.FeatureCols, Seq("person"))
        val scored = Disynth.score(hold, model)
          .groupBy(col("activity")).agg(avg(col("violation")).as("v"))
          .collect()
          .map(r => r.getString(0) -> r.getDouble(1)).toMap
        acts.zipWithIndex.foreach { case (b, j) => m(i, j) = scored(b) }
      }
      (acts, m)
    } finally all.unpersist()
  }
}
