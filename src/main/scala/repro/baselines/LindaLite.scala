package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

/** LINDA-lite (Böhm et al., CIKM 2012): like SiGMa, but fully automated —
  * relations are considered compatible when their *names* are similar
  * (small edit distance), a requirement that rarely holds under the extreme
  * schema heterogeneity of Web data (paper §5). Its published Restaurant
  * numbers show high precision / low recall, modeled by the conservative
  * acceptance threshold.
  */
object LindaLite {
  def run(spark: SparkSession, kb1: DataFrame, kb2: DataFrame,
          valueWeight: Double = 0.7,
          threshold: Double = 0.5,
          minNameSim: Double = 0.75): DataFrame = {
    val compat: IterativeMatcher.RelCompat = (p1, p2) => {
      val s = IterativeMatcher.editSimilarity(stripVocab(p1), stripVocab(p2))
      if (s >= minNameSim) s else 0.0
    }
    IterativeMatcher.run(spark, kb1, kb2,
      IterativeMatcher.IterConfig(valueWeight, threshold, compat))
  }

  private def stripVocab(p: String): String = p.dropWhile(_ != ':').drop(1) match {
    case "" => p
    case s => s
  }
}
