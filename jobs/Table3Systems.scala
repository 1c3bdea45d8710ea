package repro.jobs

import repro.data.DatasetProfile
import repro.harness.{PaperNumbers, Tables}

/** spark-submit entrypoint reproducing Table 3 (MinoanER vs baselines).
  * Optional args: profile names to restrict to (default: all four).
  */
object Table3Systems {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("minoaner-table3")
    val profiles =
      if (args.nonEmpty) args.toSeq.map(DatasetProfile.byName)
      else DatasetProfile.all
    try {
      for (p <- profiles) {
        val b = Tables.bundle(spark, p)
        val rows = Tables.table3(spark, b)
        println(Tables.renderScoresTable("Table 3", b, PaperNumbers.table3, rows))
        Tables.releaseBundle(b)
      }
    } finally spark.stop()
  }
}
