package repro.stats

/** Small driver-side statistics helpers shared by the experiments. */
object Stats {

  /** Pearson correlation coefficient; 0.0 when either side is constant
    * (a flat drift curve carries no correlation signal).
    */
  def pearson(xs: Seq[Double], ys: Seq[Double]): Double = {
    require(xs.length == ys.length && xs.nonEmpty, "pearson: mismatched/empty input")
    val n = xs.length
    val mx = xs.sum / n; val my = ys.sum / n
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    for (i <- xs.indices) {
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxy += dx * dy; sxx += dx * dx; syy += dy * dy
    }
    if (sxx <= 1e-30 || syy <= 1e-30) 0.0 else sxy / math.sqrt(sxx * syy)
  }

  /** Min-max normalization to [0,1]; a flat sequence maps to all zeros
    * (matching how the paper normalizes per-method drift magnitudes in
    * Fig. 8).
    */
  def minMaxNormalize(xs: Seq[Double]): Seq[Double] = {
    val lo = xs.min; val hi = xs.max
    if (hi - lo <= 1e-30) xs.map(_ => 0.0) else xs.map(x => (x - lo) / (hi - lo))
  }
}
