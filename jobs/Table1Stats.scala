package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.DatasetProfile
import repro.harness.Tables

/** spark-submit entrypoint reproducing Table 1 (dataset statistics) over
  * the four synthetic dataset analogues.
  */
object Table1Stats {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("minoaner-table1")
    try {
      for (p <- DatasetProfile.all) {
        val b = Tables.bundle(spark, p)
        println(Tables.renderTable1(b, Tables.table1(b)))
        Tables.releaseBundle(b)
      }
    } finally spark.stop()
  }
}

/** Shared SparkSession builder for the job entrypoints. */
object JobSession {
  def build(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}
