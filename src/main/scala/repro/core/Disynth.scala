package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{NumericType, StringType, BooleanType}
import repro.stats.Moments

/** DISYNTH — end-to-end conformance-constraint (data-invariant) discovery
  * and violation scoring.
  *
  * Discovery (§4): fit the global simple invariant of Algorithm 1 plus, for
  * every qualifying categorical attribute (≤ 50 distinct values, the
  * paper's threshold), a disjunctive invariant with one simple invariant
  * per partition. All per-partition moments for one attribute come from a
  * single `groupBy` scan.
  *
  * Scoring: a `DataFrame → DataFrame` transformation appending a
  * `violation ∈ [0,1]` column — a deterministic UDF closing over the fitted
  * model (small: O(m²) doubles per partition), no shuffle.
  */
object Disynth {

  /** Discovery knobs.
    *
    * @param pca           Algorithm 1 parameters
    * @param maxDistinct   categorical attributes with more distinct values
    *                      than this are not used for partitioning (paper: 50)
    * @param minPartRows   partitions with fewer rows get no invariant (their
    *                      branch would be all noise); tuples falling in them
    *                      score 1 like unseen values
    */
  final case class Config(
      pca: PcaSynth.Config = PcaSynth.Config(),
      maxDistinct: Int = 50,
      minPartRows: Long = 2L,
  )

  /** Fit a model with explicit attribute roles.
    *
    * @param df            training data
    * @param numericCols   numeric attributes the projections range over
    * @param partitionCols categorical attributes to partition on (attributes
    *                      exceeding `maxDistinct` are silently skipped, as in
    *                      the paper's greedy attribute selection)
    */
  def fit(
      df: DataFrame,
      numericCols: Seq[String],
      partitionCols: Seq[String] = Nil,
      cfg: Config = Config(),
  ): ConformanceModel = {
    require(numericCols.nonEmpty, "Disynth.fit: no numeric columns")
    val global = PcaSynth.simpleInvariant(Moments.of(df, numericCols), cfg.pca)
    val disjunctive = partitionCols.flatMap { attr =>
      val grouped = Moments.byGroup(df, numericCols, attr)
      if (grouped.isEmpty || grouped.size > cfg.maxDistinct) None
      else {
        val cases = grouped.collect {
          case (v, mom) if mom.n >= cfg.minPartRows => v -> PcaSynth.simpleInvariant(mom, cfg.pca)
        }
        if (cases.isEmpty) None else Some(DisjunctiveInvariant(attr, cases))
      }
    }
    ConformanceModel(numericCols, global, disjunctive)
  }

  /** Fit with schema-driven attribute roles: numeric-typed columns become
    * projection attributes; string/boolean columns with ≤ `maxDistinct`
    * values become partitioning attributes. `exclude` drops columns entirely
    * (e.g. the ML target, which the paper's invariants never see).
    */
  def autoFit(df: DataFrame, exclude: Seq[String] = Nil, cfg: Config = Config()): ConformanceModel = {
    val fields = df.schema.fields.filterNot(f => exclude.contains(f.name))
    val numeric = fields.collect { case f if f.dataType.isInstanceOf[NumericType] => f.name }.toSeq
    val categorical = fields.collect {
      case f if f.dataType == StringType || f.dataType == BooleanType => f.name
    }.toSeq
    val usable =
      if (categorical.isEmpty) Nil
      else {
        val counts = df.agg(
          countDistinct(col(categorical.head)),
          categorical.tail.map(c => countDistinct(col(c))): _*
        ).head()
        categorical.zipWithIndex.collect {
          case (c, i) if counts.getLong(i) <= cfg.maxDistinct => c
        }
      }
    fit(df, numeric, usable, cfg)
  }

  /** Append the model's violation score to every row of `df`.
    *
    * @param outCol name of the appended score column
    */
  def score(df: DataFrame, model: ConformanceModel, outCol: String = "violation"): DataFrame = {
    val numArr: Column = array(model.numericCols.map(c => coalesce(col(c).cast("double"), lit(Double.NaN))): _*)
    val partAttrs = model.partitionAttrs
    val partArr: Column =
      if (partAttrs.isEmpty) array() else array(partAttrs.map(c => col(c).cast("string")): _*)
    val scoreUdf = udf { (xs: Seq[Double], ps: Seq[String]) =>
      val partVals = partAttrs.iterator.zip(ps.iterator).map { case (a, v) => a -> Option(v) }.toMap
      model.violation(partVals, xs.toArray)
    }
    df.withColumn(outCol, scoreUdf(numArr, partArr))
  }

  /** Average violation of a dataset against a model — the paper's drift
    * magnitude of `df` relative to the model's training data (§2, §6.2).
    */
  def avgViolation(df: DataFrame, model: ConformanceModel): Double = {
    val scored = score(df, model, "__v")
    val row = scored.agg(avg(col("__v"))).head()
    if (row.isNullAt(0)) 0.0 else row.getDouble(0)
  }
}
