package repro.drift

import org.apache.spark.sql.DataFrame
import repro.core.{ConformanceModel, Disynth}

/** W-PCA baseline (Fig. 5(b)): globally-weighted PCA invariants.
  *
  * Identical to DISYNTH's simple-invariant machinery but fitted *globally* —
  * no disjunctive partitioning — which is exactly why it misses local drift:
  * when individuals swap activities the global mixture is unchanged, so the
  * global invariants keep holding.
  */
object WeightedPca {

  /** Fit the global simple invariant over `numericCols`. */
  def fit(df: DataFrame, numericCols: Seq[String], cfg: Disynth.Config = Disynth.Config()): ConformanceModel =
    Disynth.fit(df, numericCols, partitionCols = Nil, cfg)

  /** Drift magnitude of `df` w.r.t. the fitted global model. */
  def drift(df: DataFrame, model: ConformanceModel): Double =
    Disynth.avgViolation(df, model)
}
