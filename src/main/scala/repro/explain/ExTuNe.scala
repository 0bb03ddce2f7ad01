package repro.explain

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{ConformanceModel, Disynth}

/** ExTuNe — intervention-centric explanation of tuple non-conformance
  * (§6.3): responsibility of attribute Aᵢ for a tuple's violation.
  *
  * For a non-conforming tuple t: (1) substitute t.Aᵢ with a "more typical"
  * value — the training mean of Aᵢ (the matching partition's mean when the
  * model is disjunctive, which is what "typical" means under a compound
  * invariant); (2) count how many *additional* attributes K must be
  * substituted before the tuple conforms; (3) responsibility(Aᵢ) = 1/(K+1).
  * Finding the minimum K is combinatorial, so we use the natural greedy
  * construction: repeatedly substitute the attribute that reduces the
  * violation most. Responsibilities are averaged over the test set.
  */
object ExTuNe {

  /** Violation below this counts as "no violation" (conforming). */
  val ConformEps: Double = 1e-6

  /** Per-attribute responsibility of one tuple.
    *
    * @param partVals partition-attribute values of the tuple
    * @param x        numeric values in model ordering (mutated copies only)
    */
  def tupleResponsibility(
      model: ConformanceModel,
      partVals: Map[String, Option[String]],
      x: Array[Double],
  ): Array[Double] = {
    val m = x.length
    val target = model.interventionMeans(partVals)
    val out = new Array[Double](m)
    if (model.violation(partVals, x) <= ConformEps) return out // conforming: nobody responsible

    var i = 0
    while (i < m) {
      val t = x.clone()
      t(i) = target(i)
      var v = model.violation(partVals, t)
      var k = 0
      val remaining = scala.collection.mutable.Set.from((0 until m).filter(_ != i))
      while (v > ConformEps && remaining.nonEmpty) {
        // Greedy: substitute the attribute that lowers violation the most.
        var bestJ = -1; var bestV = Double.MaxValue
        for (j <- remaining) {
          val saved = t(j)
          t(j) = target(j)
          val vj = model.violation(partVals, t)
          if (vj < bestV) { bestV = vj; bestJ = j }
          t(j) = saved
        }
        t(bestJ) = target(bestJ)
        remaining -= bestJ
        v = bestV
        k += 1
      }
      // If substituting everything still violates (unseen partition value),
      // no attribute assignment explains it: responsibility 0 across the board.
      out(i) = if (v > ConformEps) 0.0 else 1.0 / (k + 1.0)
      i += 1
    }
    out
  }

  /** Aggregate responsibility per attribute over (a sample of) `df`.
    *
    * @param maxTuples cap on tuples analysed — the greedy repair is O(m²)
    *                  model evaluations per tuple, so explanation runs on a
    *                  sample, as in the ExTuNe demo
    * @return attribute name → mean responsibility, in model column order
    */
  def aggregate(df: DataFrame, model: ConformanceModel, maxTuples: Int = 1000): Seq[(String, Double)] = {
    val partAttrs = model.partitionAttrs
    val numArr = array(model.numericCols.map(c => coalesce(col(c).cast("double"), lit(Double.NaN))): _*)
    val partArr = if (partAttrs.isEmpty) array() else array(partAttrs.map(c => col(c).cast("string")): _*)
    val rows = df.select(numArr.as("__x"), partArr.as("__p")).limit(maxTuples).collect()
    require(rows.nonEmpty, "ExTuNe.aggregate: empty input")

    val sums = new Array[Double](model.numericCols.length)
    rows.foreach { r =>
      val x = r.getSeq[Double](0).toArray
      val ps = r.getSeq[String](1)
      val partVals = partAttrs.iterator.zip(ps.iterator).map { case (a, v) => a -> Option(v) }.toMap
      val resp = tupleResponsibility(model, partVals, x)
      var i = 0
      while (i < sums.length) { sums(i) += resp(i); i += 1 }
    }
    model.numericCols.zip(sums.map(_ / rows.length).toSeq)
  }

  /** Convenience: drift score and top-k responsible attributes of `df`. */
  def explainDrift(df: DataFrame, model: ConformanceModel, topK: Int = 3, maxTuples: Int = 500)
      : (Double, Seq[(String, Double)]) = {
    val drift = Disynth.avgViolation(df, model)
    val resp = aggregate(df, model, maxTuples).sortBy(-_._2).take(topK)
    (drift, resp)
  }
}
