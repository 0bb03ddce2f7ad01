package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Disynth
import repro.data.CaseStudy
import repro.explain.ExTuNe

/** Fig. 10(a–c): ExTuNe attribute responsibilities for the three case-study
  * populations. Invariants are learned on the reference population (healthy
  * patients / cheap phones / cheap houses), responsibilities computed on the
  * shifted population.
  */
object CaseStudies {

  final case class StudyResult(study: String, responsibilities: Seq[(String, Double)])

  def run(spark: SparkSession, n: Long = 5000, respSample: Int = 200, seed: Long = 41)
      : Seq[StudyResult] = {
    def study(name: String, train: DataFrame, test: DataFrame): StudyResult = {
      val model = Disynth.autoFit(train)
      StudyResult(name, ExTuNe.aggregate(test, model, maxTuples = respSample).sortBy(-_._2))
    }
    Seq(
      study("Cardio",
        CaseStudy.cardio(spark, n, diseased = false, seed),
        CaseStudy.cardio(spark, n, diseased = true, seed + 1)),
      study("MobilePrice",
        CaseStudy.mobile(spark, n, expensive = false, seed + 2),
        CaseStudy.mobile(spark, n, expensive = true, seed + 3)),
      study("HousePrice",
        CaseStudy.house(spark, n, expensive = false, seed + 4),
        CaseStudy.house(spark, n, expensive = true, seed + 5)),
    )
  }
}
