package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

/** RiMOM-lite (Shao et al., JCST 2016): iterative instance matching over
  * aligned relations (attribute alignment is part of its required input —
  * paper §5: “this method requires attribute alignment”), with the
  * RiMOM-IM completion heuristic: when all but one pair of neighbors via an
  * aligned relation pair are matched, the remaining pair is matched too.
  */
object RimomLite {
  def run(spark: SparkSession, kb1: DataFrame, kb2: DataFrame,
          relAlignment: Map[String, String],
          valueWeight: Double = 0.6,
          threshold: Double = 0.42): DataFrame = {
    val aligned = relAlignment.toSet
    val compat: IterativeMatcher.RelCompat =
      (p1, p2) => if (aligned((p1, p2))) 1.0 else 0.0
    IterativeMatcher.run(spark, kb1, kb2,
      IterativeMatcher.IterConfig(valueWeight, threshold, compat,
        siblingCompletion = true))
  }
}
