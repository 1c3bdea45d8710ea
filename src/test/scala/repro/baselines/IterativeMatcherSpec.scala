package repro.baselines

import repro.{SparkSpec, TestKBs}
import repro.data.WebKBGen

class IterativeMatcherSpec extends SparkSpec {

  test("editSimilarity of identical strings is 1") {
    assert(IterativeMatcher.editSimilarity("chef", "chef") === 1.0)
  }

  test("editSimilarity of disjoint strings is low") {
    assert(IterativeMatcher.editSimilarity("abc", "xyz") === 0.0)
  }

  test("editSimilarity handles empty strings") {
    assert(IterativeMatcher.editSimilarity("", "") === 1.0)
    assert(IterativeMatcher.editSimilarity("a", "") === 0.0)
  }

  test("editSimilarity is symmetric") {
    assert(IterativeMatcher.editSimilarity("haschef", "headchef") ===
           IterativeMatcher.editSimilarity("headchef", "haschef"))
  }

  test("generator's Similar relation names are edit-similar, Dissimilar are not") {
    val pSim = TestKBs.tinyProfile // Similar style
    val r1 = WebKBGen.relName(pSim, 1, 0)
    val r2 = WebKBGen.relName(pSim, 2, 0)
    assert(IterativeMatcher.editSimilarity(r1, r2) > 0.6, s"$r1 vs $r2")
  }

  test("nameSeeds finds the unique shared figure-1 name") {
    val seeds = IterativeMatcher.nameSeeds(TestKBs.kb1(spark), TestKBs.kb2(spark))
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(seeds === Set((TestKBs.JohnLakeA, TestKBs.JonnyLake)))
  }

  test("valueScores are normalized and positive for overlapping pairs") {
    val v = IterativeMatcher.valueScores(TestKBs.kb1(spark), TestKBs.kb2(spark))
      .collect().map(r => r.getDouble(2))
    assert(v.nonEmpty)
    assert(v.forall(s => s > 0 && s <= 1.0 + 1e-9))
  }

  test("figure-1: SiGMa-lite style run matches all three pairs via propagation") {
    val align = Map("hasChef" -> "headChef", "territorial" -> "county")
    val compat: IterativeMatcher.RelCompat =
      (p1, p2) => if (align.get(p1).contains(p2)) 1.0 else 0.0
    val m = IterativeMatcher.run(spark, TestKBs.kb1(spark), TestKBs.kb2(spark),
      IterativeMatcher.IterConfig(valueWeight = 0.5, threshold = 0.1, relCompat = compat))
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(m.contains((TestKBs.JohnLakeA, TestKBs.JonnyLake)))
    assert(m.contains((TestKBs.Bray, TestKBs.Berkshire)))
    assert(m.contains((TestKBs.Restaurant1, TestKBs.Restaurant2)))
  }

  test("a high threshold suppresses low-value matches") {
    val compat: IterativeMatcher.RelCompat = (_, _) => 0.0
    val m = IterativeMatcher.run(spark, TestKBs.kb1(spark), TestKBs.kb2(spark),
      IterativeMatcher.IterConfig(valueWeight = 1.0, threshold = 0.99,
        relCompat = compat, seedFromNames = false))
    assert(m.count() === 0)
  }

  test("matches form a partial 1-1 mapping") {
    val g = WebKBGen.generate(spark, TestKBs.tinyProfile)
    val m = SigmaLite.run(spark, g.kb1, g.kb2, g.relAlignment)
      .collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(m.map(_._1).distinct.length === m.length)
    assert(m.map(_._2).distinct.length === m.length)
  }

  test("SiGMa-lite on the strongly similar tiny profile reaches high F1") {
    val g = WebKBGen.generate(spark, TestKBs.tinyProfile)
    val s = repro.core.Evaluation.scoreRestricted(
      SigmaLite.run(spark, g.kb1, g.kb2, g.relAlignment), g.truth)
    assert(s.f1 > 0.8, s"scores: ${s.pct}")
  }

  test("RiMOM-lite runs and produces sane output on the tiny profile") {
    val g = WebKBGen.generate(spark, TestKBs.tinyProfile)
    val s = repro.core.Evaluation.scoreRestricted(
      RimomLite.run(spark, g.kb1, g.kb2, g.relAlignment), g.truth)
    assert(s.f1 > 0.5, s"scores: ${s.pct}")
  }

  test("LINDA-lite works on similar relation names") {
    val g = WebKBGen.generate(spark, TestKBs.tinyProfile)
    val s = repro.core.Evaluation.scoreRestricted(
      LindaLite.run(spark, g.kb1, g.kb2), g.truth)
    assert(s.precision > 0.7, s"scores: ${s.pct}")
  }
}
