package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession bootstrap for the spark-submit entrypoints. */
object JobSession {
  /** Build (or reuse) a local session configured like the test harness. */
  def get(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Render a labeled matrix as an aligned text table. */
  def matrix(rowLabels: Seq[String], colLabels: Seq[String], cell: (Int, Int) => Double): String = {
    val header = ("" +: colLabels).map(l => f"$l%10s").mkString(" ")
    val body = rowLabels.zipWithIndex.map { case (r, i) =>
      (f"$r%10s" +: colLabels.indices.map(j => f"${cell(i, j)}%10.3f")).mkString(" ")
    }
    (header +: body).mkString("\n")
  }
}
