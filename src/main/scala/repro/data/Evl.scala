package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic Extreme-Verification-Latency benchmark (substitute for the 16
  * streams of Souza et al., §6.2).
  *
  * Ten parametrized streams of drifting 2-D Gaussian mixtures, one
  * categorical class attribute each, with an *analytic* ground-truth drift
  * trajectory (mean class-center displacement from the first window). The
  * set covers the benchmark's two regimes:
  *
  *  - global drift (translations: 1CDT, 2CDT, 1CHT, 2CHT, 5CVT, UG/MG):
  *    every reasonable detector should track it
  *  - local drift in a stable global mixture (4CR rotation, FG-2C-2D label
  *    rotation over fixed modes, 4CRE-V2 rotation-dominated): only
  *    class-aware (disjunctive) models can see it — the regime where the
  *    paper reports PCA-SPLL and CD failing
  */
object Evl {

  /** All implemented stream names. */
  val Datasets: Seq[String] = Seq(
    "1CDT", "2CDT", "1CHT", "2CHT", "5CVT", "4CR", "4CRE-V2", "UG-2C-2D", "MG-2C-2D", "FG-2C-2D")

  /** Streams whose drift is purely/mostly local (global mixture ~stable). */
  val LocalDriftDatasets: Seq[String] = Seq("4CR", "4CRE-V2", "FG-2C-2D")

  /** Per-mode Gaussian σ (isotropic). */
  val Sigma: Double = 1.0

  /** Mode centers per class at normalized time τ ∈ [0,1].
    *
    * @return (className, modes) pairs; a class may be multimodal
    */
  def centers(name: String, tau: Double): Seq[(String, Seq[(Double, Double)])] = name match {
    // Trajectories deliberately have components both along and across the
    // class-separation axis (as in the real streams): a translation aligned
    // *exactly* with the top principal component would be invisible to any
    // low-variance-subspace method by construction, which is not the regime
    // the benchmark tests.
    case "1CDT" => Seq(
      "A" -> Seq((0.0, 0.0)),
      "B" -> Seq((3.0 + 4 * tau, 3.0 - 4 * tau)))
    case "2CDT" => Seq(
      "A" -> Seq((4 * tau, -4 * tau)),
      "B" -> Seq((8.0 - 4 * tau, 8.0 + 4 * tau)))
    case "1CHT" => Seq(
      "A" -> Seq((0.0, 0.0)),
      "B" -> Seq((4.0 + 6 * tau, 3.0)))
    case "2CHT" => Seq(
      "A" -> Seq((6 * tau, 0.0)),
      "B" -> Seq((8.0 - 6 * tau, 5.0)))
    case "5CVT" => (0 until 5).map(k => s"C$k" -> Seq((3.0 * k, 8 * tau)))
    case "4CR" => (0 until 4).map { k =>
      val th = math.Pi / 2 * k + 2 * math.Pi * tau
      s"C$k" -> Seq((5 * math.cos(th), 5 * math.sin(th)))
    }
    case "4CRE-V2" => (0 until 4).map { k =>
      val th = math.Pi / 2 * k + 2 * math.Pi * tau
      val r = 5.0 + 3 * tau
      s"C$k" -> Seq((r * math.cos(th), r * math.sin(th)))
    }
    case "UG-2C-2D" => Seq(
      "A" -> Seq((0.0, 4 * math.sin(2 * math.Pi * tau))),
      "B" -> Seq((6.0, -4 * math.sin(2 * math.Pi * tau))))
    case "MG-2C-2D" => Seq(
      "A" -> Seq((6 * tau, 5 * tau), (6 * tau, 6.0 + 5 * tau)),
      "B" -> Seq((10.0, 3.0)))
    case "FG-2C-2D" =>
      // Four fixed modes; the class→mode assignment rotates with time, so
      // labels drift while the global point cloud never changes.
      val modes = Seq((0.0, 0.0), (8.0, 0.0), (8.0, 8.0), (0.0, 8.0))
      val j = math.min(3, (tau * 4).toInt)
      Seq(
        "A" -> Seq(modes(j), modes((j + 1) % 4)),
        "B" -> Seq(modes((j + 2) % 4), modes((j + 3) % 4)))
    case other => throw new IllegalArgumentException(s"Evl: unknown dataset $other")
  }

  private def tauOf(window: Int, nWindows: Int): Double =
    if (nWindows <= 1) 0.0 else (window - 1).toDouble / (nWindows - 1)

  /** Ground-truth drift of a window relative to window 1: mean over classes
    * of the Euclidean displacement of the class mean (multimodal classes use
    * the mean of their mode centers).
    */
  def groundTruth(name: String, window: Int, nWindows: Int): Double = {
    def classMeans(tau: Double): Map[String, (Double, Double)] =
      centers(name, tau).map { case (c, modes) =>
        c -> (modes.map(_._1).sum / modes.size, modes.map(_._2).sum / modes.size)
      }.toMap
    val c0 = classMeans(tauOf(1, nWindows))
    val cw = classMeans(tauOf(window, nWindows))
    val ds = c0.keys.map { c =>
      val (x0, y0) = c0(c); val (x1, y1) = cw(c)
      math.hypot(x1 - x0, y1 - y0)
    }
    ds.sum / ds.size
  }

  /** Generate one window of a stream.
    *
    * @param pointsPerClass tuples per class (split across a class's modes)
    * @return DataFrame with columns `cls` (string), `x`, `y`
    */
  def window(
      spark: SparkSession,
      name: String,
      window: Int,
      nWindows: Int,
      pointsPerClass: Int,
      seed: Long = 23,
  ): DataFrame = {
    val tau = tauOf(window, nWindows)
    val parts = centers(name, tau).zipWithIndex.flatMap { case ((cls, modes), ci) =>
      val perMode = math.max(1, pointsPerClass / modes.size)
      modes.zipWithIndex.map { case ((cx, cy), mi) =>
        val s = seed + window * 1000 + ci * 10 + mi
        spark.range(perMode).select(
          lit(cls).as("cls"),
          (lit(cx) + randn(s) * Sigma).as("x"),
          (lit(cy) + randn(s + 1) * Sigma).as("y"))
      }
    }
    parts.reduce(_ unionAll _)
  }
}
