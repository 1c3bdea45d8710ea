package repro.jobs

import repro.data.DatasetProfile
import repro.harness.{PaperNumbers, Tables}

/** spark-submit entrypoint reproducing Table 4 (matching-rule ablation). */
object Table4Rules {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("minoaner-table4")
    val profiles =
      if (args.nonEmpty) args.toSeq.map(DatasetProfile.byName)
      else DatasetProfile.all
    try {
      for (p <- profiles) {
        val b = Tables.bundle(spark, p)
        val rows = Tables.table4(spark, b)
        println(Tables.renderScoresTable("Table 4", b, PaperNumbers.table4, rows))
        Tables.releaseBundle(b)
      }
    } finally spark.stop()
  }
}
