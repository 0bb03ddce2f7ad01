package repro.drift

import org.apache.spark.sql.DataFrame
import repro.SparkSpec

class DriftBaselinesSpec extends SparkSpec {

  import spark.implicits._

  private def gauss(n: Int, cx: Double, cy: Double, sigma: Double, seed: Int): DataFrame = {
    val rnd = new scala.util.Random(seed)
    (1 to n).map(_ => (cx + rnd.nextGaussian() * sigma, cy + rnd.nextGaussian() * sigma))
      .toDF("x", "y")
  }

  // Two clusters rotating around the origin: global mixture is stable.
  private def twoClusterRotation(n: Int, angle: Double, seed: Int): DataFrame = {
    val rnd = new scala.util.Random(seed)
    val r = 5.0
    (1 to n).map { i =>
      val base = if (i % 2 == 0) angle else angle + math.Pi
      (r * math.cos(base) + rnd.nextGaussian(), r * math.sin(base) + rnd.nextGaussian())
    }.toDF("x", "y")
  }

  // ---------------- PCA-SPLL ----------------

  test("PCA-SPLL: identical distribution yields a small, stable statistic") {
    val ref = gauss(2000, 0, 0, 1, 1)
    val model = PcaSpll.fit(ref, Seq("x", "y"))
    val same = PcaSpll.drift(gauss(2000, 0, 0, 1, 2), model)
    // Mean Mahalanobis² per retained component ≈ 1.
    assert(same < 3.0)
  }

  test("PCA-SPLL: a mean shift raises the statistic sharply") {
    val ref = gauss(2000, 0, 0, 1, 3)
    val model = PcaSpll.fit(ref, Seq("x", "y"))
    val base = PcaSpll.drift(gauss(1000, 0, 0, 1, 4), model)
    val shifted = PcaSpll.drift(gauss(1000, 6, 0, 1, 5), model)
    assert(shifted > 5 * base, s"base=$base shifted=$shifted")
  }

  test("PCA-SPLL: drift grows monotonically with displacement") {
    val ref = gauss(2000, 0, 0, 1, 6)
    val model = PcaSpll.fit(ref, Seq("x", "y"))
    val scores = Seq(0.0, 2.0, 4.0, 8.0).map(d => PcaSpll.drift(gauss(800, d, d, 1, 7), model))
    assert(scores.zip(scores.tail).forall { case (a, b) => a < b })
  }

  test("PCA-SPLL retains the low-variance tail of components") {
    val rnd = new scala.util.Random(8)
    // x wide, y narrow: the retained component must be y-dominated.
    val ref = (1 to 2000).map(_ => (rnd.nextGaussian() * 10, rnd.nextGaussian() * 0.5)).toDF("x", "y")
    val model = PcaSpll.fit(ref, Seq("x", "y"), varianceFraction = 0.25)
    assert(model.components.nonEmpty)
    // After standardization both axes have unit variance; with a fraction of
    // 25% only the single lowest-variance component is retained.
    assert(model.components.length == 1)
  }

  test("PCA-SPLL is blind to local drift in a stable global mixture (paper's failure mode)") {
    val model = PcaSpll.fit(twoClusterRotation(3000, 0.0, 9), Seq("x", "y"))
    val base = PcaSpll.drift(twoClusterRotation(1500, 0.0, 10), model)
    // Rotating by π maps the mixture onto itself: no global change visible.
    val rotated = PcaSpll.drift(twoClusterRotation(1500, math.Pi, 11), model)
    assert(rotated < 2 * base + 1.0, s"base=$base rotated=$rotated")
  }

  // ---------------- CD (MKL / Area) ----------------

  test("CD: identical distribution yields near-zero divergence") {
    val ref = gauss(3000, 0, 0, 1, 12)
    val model = ChangeDetection.fit(ref, Seq("x", "y"))
    val mkl = ChangeDetection.drift(gauss(3000, 0, 0, 1, 13), model, ChangeDetection.MKL)
    val area = ChangeDetection.drift(gauss(3000, 0, 0, 1, 14), model, ChangeDetection.Area)
    assert(mkl < 0.5, s"mkl=$mkl")
    assert(area < 0.15, s"area=$area")
  }

  test("CD: a mean shift is detected by both metrics") {
    val ref = gauss(3000, 0, 0, 1, 15)
    val model = ChangeDetection.fit(ref, Seq("x", "y"))
    val mkl = ChangeDetection.drift(gauss(3000, 5, 0, 1, 16), model, ChangeDetection.MKL)
    val area = ChangeDetection.drift(gauss(3000, 5, 0, 1, 17), model, ChangeDetection.Area)
    assert(mkl > 2.0, s"mkl=$mkl")
    assert(area > 0.7, s"area=$area")
  }

  test("CD-Area saturates once windows stop overlapping (cannot quantify)") {
    val ref = gauss(2000, 0, 0, 1, 18)
    val model = ChangeDetection.fit(ref, Seq("x", "y"))
    val far = ChangeDetection.drift(gauss(2000, 8, 0, 1, 19), model, ChangeDetection.Area)
    val farther = ChangeDetection.drift(gauss(2000, 16, 0, 1, 20), model, ChangeDetection.Area)
    // Both are ≈ 1: Area cannot distinguish 8σ from 16σ displacement.
    assert(far > 0.95 && farther > 0.95)
    assert(math.abs(far - farther) < 0.05)
  }

  test("CD histograms are insensitive to class-label-only (local) drift") {
    val model = ChangeDetection.fit(twoClusterRotation(3000, 0.0, 21), Seq("x", "y"))
    val rotated = ChangeDetection.drift(twoClusterRotation(3000, math.Pi, 22), model, ChangeDetection.Area)
    assert(rotated < 0.2, s"rotated=$rotated")
  }

  // ---------------- W-PCA wrapper ----------------

  test("W-PCA is Disynth without partitions: flags global drift") {
    val ref = gauss(2000, 0, 0, 1, 23)
    val model = WeightedPca.fit(ref, Seq("x", "y"))
    assert(model.disjunctive.isEmpty)
    assert(WeightedPca.drift(gauss(1000, 0, 0, 1, 24), model) < 0.02)
    assert(WeightedPca.drift(gauss(1000, 10, 10, 1, 25), model) > 0.3)
  }
}
