package repro.stats

import org.scalatest.funsuite.AnyFunSuite

class StatsSpec extends AnyFunSuite {

  test("pearson of a perfectly linear relation is ±1") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Stats.pearson(xs, xs.map(_ * 2 + 1)) - 1.0) < 1e-12)
    assert(math.abs(Stats.pearson(xs, xs.map(x => -3 * x)) + 1.0) < 1e-12)
  }

  test("pearson of a constant sequence is defined as 0") {
    assert(Stats.pearson(Seq(1.0, 1.0, 1.0), Seq(1.0, 2.0, 3.0)) == 0.0)
    assert(Stats.pearson(Seq(1.0, 2.0, 3.0), Seq(5.0, 5.0, 5.0)) == 0.0)
  }

  test("pearson is symmetric") {
    val a = Seq(1.0, 4.0, 2.0, 8.0); val b = Seq(3.0, 1.0, 7.0, 2.0)
    assert(math.abs(Stats.pearson(a, b) - Stats.pearson(b, a)) < 1e-12)
  }

  test("pearson known value") {
    // cov = 2.5 over stds sqrt(1.25)·sqrt(5) => 1.0 for y=2x; perturb one point.
    val x = Seq(1.0, 2.0, 3.0, 4.0)
    val y = Seq(2.0, 4.0, 6.0, 9.0)
    val r = Stats.pearson(x, y)
    assert(r > 0.98 && r < 1.0)
  }

  test("pearson rejects mismatched lengths") {
    intercept[IllegalArgumentException](Stats.pearson(Seq(1.0), Seq(1.0, 2.0)))
  }

  test("minMaxNormalize maps extremes to 0 and 1") {
    val r = Stats.minMaxNormalize(Seq(2.0, 4.0, 6.0))
    assert(r == Seq(0.0, 0.5, 1.0))
  }

  test("minMaxNormalize maps a flat sequence to zeros") {
    assert(Stats.minMaxNormalize(Seq(3.0, 3.0, 3.0)) == Seq(0.0, 0.0, 0.0))
  }

  test("minMaxNormalize preserves ordering") {
    val xs = Seq(5.0, -1.0, 2.0, 9.0)
    val r = Stats.minMaxNormalize(xs)
    assert(xs.zip(r).sortBy(_._1).map(_._2) == r.sorted)
  }
}
