package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType

/** Synthetic LED benchmark (substitute for the MOA LED stream, §6.1/§6.3).
  *
  * A `digit` attribute (0–9), 7 binary segment attributes (`led1`–`led7`,
  * the standard seven-segment encoding of the digit with 1% flip noise),
  * and 17 irrelevant uniform binary attributes. Gradual concept drift every
  * 5 windows: a scheduled subset of segments malfunctions (each reading
  * flips with probability 0.5), matching the paper's Fig. 10(d) setup of
  * drift every 25,000 rows with 5,000-row windows.
  */
object Led {

  val SegmentCols: Seq[String] = (1 to 7).map(i => s"led$i")
  val IrrelevantCols: Seq[String] = (1 to 17).map(i => s"irr$i")
  val FeatureCols: Seq[String] = SegmentCols ++ IrrelevantCols

  /** Seven-segment encoding: for each digit, which of led1..led7 are lit
    * (segments a,b,c,d,e,f,g in order).
    */
  val Encoding: Map[Int, Seq[Int]] = Map(
    0 -> Seq(1, 1, 1, 1, 1, 1, 0),
    1 -> Seq(0, 1, 1, 0, 0, 0, 0),
    2 -> Seq(1, 1, 0, 1, 1, 0, 1),
    3 -> Seq(1, 1, 1, 1, 0, 0, 1),
    4 -> Seq(0, 1, 1, 0, 0, 1, 1),
    5 -> Seq(1, 0, 1, 1, 0, 1, 1),
    6 -> Seq(1, 0, 1, 1, 1, 1, 1),
    7 -> Seq(1, 1, 1, 0, 0, 0, 0),
    8 -> Seq(1, 1, 1, 1, 1, 1, 1),
    9 -> Seq(1, 1, 1, 1, 0, 1, 1),
  )

  /** Which segments (1-based) malfunction in a given 1-based window:
    * windows 1–5 none, 6–10 LEDs {4,5}, 11–15 {1,3}, 16–20 {6,7}.
    */
  def malfunctioningLeds(window: Int): Seq[Int] = ((window - 1) / 5) match {
    case 0 => Seq.empty
    case 1 => Seq(4, 5)
    case 2 => Seq(1, 3)
    case _ => Seq(6, 7)
  }

  /** Generate one 1-based window. Columns: `digit` (string, the partitioning
    * attribute), `led1..7`, `irr1..17` (all 0/1 integers).
    */
  def window(spark: SparkSession, window: Int, rows: Int, seed: Long = 31): DataFrame = {
    val bad = malfunctioningLeds(window).toSet
    val base = spark.range(rows.toLong)
      .withColumn("digitIdx", (rand(seed + window * 100) * 10).cast(IntegerType))

    val segExprs = SegmentCols.zipWithIndex.map { case (name, i) =>
      val perDigit = (0 to 9).map(d => lit(Encoding(d)(i)))
      val clean = element_at(array(perDigit: _*), col("digitIdx") + 1)
      val noiseFlip = (rand(seed + window * 100 + 10 + i) < 0.01).cast(IntegerType)
      val malfFlip =
        if (bad.contains(i + 1)) (rand(seed + window * 100 + 40 + i) < 0.5).cast(IntegerType)
        else lit(0)
      // XOR via arithmetic: a ⊕ b = a + b − 2ab, chained for both flips.
      val f1 = clean + noiseFlip - lit(2) * clean * noiseFlip
      (f1 + malfFlip - lit(2) * f1 * malfFlip).cast(IntegerType).as(name)
    }
    val irrExprs = IrrelevantCols.zipWithIndex.map { case (name, i) =>
      (rand(seed + window * 100 + 60 + i) < 0.5).cast(IntegerType).as(name)
    }
    base.select(col("digitIdx").cast("string").as("digit") +: (segExprs ++ irrExprs): _*)
  }
}
