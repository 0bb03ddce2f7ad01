package repro.bench

import repro.SparkSpec
import repro.data.Har
import repro.exp.HarExperiments
import repro.linalg.Mat

private object HeatmapFmt {
  def print(rowLabels: Seq[String], colLabels: Seq[String], m: Mat): Unit = {
    println(("" +: colLabels).map(l => f"$l%9s").mkString)
    rowLabels.zipWithIndex.foreach { case (r, i) =>
      println((f"$r%9s" +: colLabels.indices.map(j => f"${m(i, j)}%9.2f")).mkString)
    }
  }
}

/** Reproduces the Figure 6 table: 15×15 inter-person invariant violation.
  *
  * Paper: diagonal ≈ 0 (self), typical off-diagonal ≈ 0.3, with rows/columns
  * of the unusual-fitness/BMI persons (e.g. p3, p8, p15) standing out ≈ 0.5.
  */
class Fig6InterPersonBench extends SparkSpec {

  test("Figure 6: inter-person violation heat map") {
    val (persons, m) = HarExperiments.interPerson(spark, rowsPerPersonActivity = 400)
    println("\n=== Figure 6 — inter-person violation (row = model, column = data) ===")
    HeatmapFmt.print(persons, persons, m)
    println("metadata (person, fitness, BMI, gender):")
    Har.PersonMeta.foreach { case (p, f, b, g) => println(f"  $p%-4s $f%-9s $b%-12s $g") }
    println("paper: diagonal ≈ 0, typical cell ≈ 0.3, outlier rows (p3/p8/p15) ≈ 0.5\n")

    val n = persons.length
    val diag = (0 until n).map(i => m(i, i))
    val off = for (i <- 0 until n; j <- 0 until n if i != j) yield m(i, j)
    assert(diag.max < 0.1, s"max self-violation ${diag.max}")
    assert(off.sum / off.size > 0.15, s"mean cross-violation ${off.sum / off.size}")
    assert(off.min > diag.max)
    // Outlier persons produce hotter rows than the average person.
    val rowMean = (i: Int) => (0 until n).filter(_ != i).map(m(i, _)).sum / (n - 1)
    val outliers = Seq("p3", "p8", "p15").map(p => rowMean(persons.indexOf(p)))
    val normals = persons.indices.filterNot(i => Seq("p3", "p8", "p15").contains(persons(i)))
      .map(rowMean)
    assert(outliers.min > normals.sum / normals.size,
      s"outlier rows $outliers vs normal mean ${normals.sum / normals.size}")
  }
}

/** Reproduces the Figure 7 table: 5×5 inter-activity invariant violation.
  *
  * Paper (row = model, column = data):
  * {{{
  *            lying standing sitting walking running
  * lying       0.05   0.41    0.57    0.68    0.78
  * standing    0.62   0.02    0.51    0.56    0.71
  * sitting     0.57   0.23    0.04    0.59    0.72
  * walking     0.21   0.01    0.06    0       0.25
  * running     0.12   0       0.03    0.02    0.01
  * }}}
  * Key shape: mobile data violates sedentary invariants far more than the
  * reverse — mobile activities are a safety envelope for sedentary ones.
  */
class Fig7InterActivityBench extends SparkSpec {

  test("Figure 7: inter-activity violation heat map") {
    val (acts, m) = HarExperiments.interActivity(spark, rowsPerPersonActivity = 400)
    println("\n=== Figure 7 — inter-activity violation (row = model, column = data) ===")
    HeatmapFmt.print(acts, acts, m)
    println("paper: see table in scaladoc; mobile→sedentary ≫ sedentary→mobile\n")

    def v(model: String, data: String): Double = m(acts.indexOf(model), acts.indexOf(data))
    acts.foreach(a => assert(v(a, a) < 0.1, s"self $a = ${v(a, a)}"))
    Har.Sedentary.foreach { sed =>
      Har.Mobile.foreach { mob =>
        assert(v(sed, mob) > v(mob, sed), s"$sed←$mob ${v(sed, mob)} !> $mob←$sed ${v(mob, sed)}")
      }
      assert(v("running", sed) < 0.15, s"running's envelope should cover $sed")
    }
    // Sedentary activities are mutually violating (tight separated clusters).
    assert(v("lying", "standing") > 0.3)
    assert(v("standing", "lying") > 0.3)
  }
}
