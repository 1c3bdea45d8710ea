package repro.jobs

import repro.data.DatasetProfile
import repro.harness.Tables

/** spark-submit entrypoint reproducing Table 2 (block statistics). */
object Table2Blocks {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("minoaner-table2")
    try {
      for (p <- DatasetProfile.all) {
        val b = Tables.bundle(spark, p)
        println(Tables.renderTable2(b, Tables.table2(b)))
        Tables.releaseBundle(b)
      }
    } finally spark.stop()
  }
}
