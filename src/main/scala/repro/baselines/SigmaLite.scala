package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

/** SiGMa-lite (Lacoste-Julien et al., KDD 2013): greedy collective matching
  * seeded by identical entity names, propagating over *pre-aligned*
  * relations. The true relation alignment is part of its input — modeling
  * the domain-expert alignment the original assumes (paper §5: “linked with
  * pre-aligned relations”); MinoanER needs no such input.
  */
object SigmaLite {
  def run(spark: SparkSession, kb1: DataFrame, kb2: DataFrame,
          relAlignment: Map[String, String],
          valueWeight: Double = 0.6,
          threshold: Double = 0.32): DataFrame = {
    val aligned = relAlignment.toSet
    val compat: IterativeMatcher.RelCompat =
      (p1, p2) => if (aligned((p1, p2))) 1.0 else 0.0
    IterativeMatcher.run(spark, kb1, kb2,
      IterativeMatcher.IterConfig(valueWeight, threshold, compat))
  }
}
