package repro.harness

import repro.{SparkSpec, TestKBs}

class TablesSpec extends SparkSpec {

  private lazy val bundle = Tables.bundle(spark,
    TestKBs.tinyProfile.copy(name = "restaurant-lite"))

  test("table1 computes stats for both KBs") {
    val r = Tables.table1(bundle)
    assert(r.stats1.entities === TestKBs.tinyProfile.n1)
    assert(r.stats2.entities === TestKBs.tinyProfile.n2)
    assert(r.matches === TestKBs.tinyProfile.nMatches)
  }

  test("renderTable1 includes paper and measured columns") {
    val out = Tables.renderTable1(bundle, Tables.table1(bundle))
    assert(out.contains("E1/E2 entities"))
    assert(out.contains("339/2256")) // paper value for the restaurant analogue
    assert(out.contains(s"${TestKBs.tinyProfile.n1}/${TestKBs.tinyProfile.n2}"))
  }

  test("table2 block recall is high on the strong tiny profile") {
    val s = Tables.table2(bundle)
    assert(s.recall > 90.0, s"recall=${s.recall}")
    assert(s.tokenComparisons > 0)
  }

  test("renderTable2 renders every statistic row") {
    val out = Tables.renderTable2(bundle, Tables.table2(bundle))
    for (k <- Seq("|B_N|", "|B_T|", "Precision", "Recall", "F1"))
      assert(out.contains(k), s"missing $k")
  }

  test("systemsFor follows the paper's reported cells") {
    assert(Tables.systemsFor("restaurant-lite") ===
      Seq("SiGMa", "LINDA", "RiMOM", "PARIS", "BSL", "MinoanER"))
    assert(Tables.systemsFor("bbcmusic-dbpedia-lite") ===
      Seq("PARIS", "BSL", "MinoanER"))
  }

  test("runSystem executes MinoanER on the tiny bundle") {
    val s = Tables.runSystem(spark, bundle, "MinoanER")
    assert(s.f1 > 0.8, s.pct)
  }

  test("table4 produces one row per ablation variant") {
    val rows = Tables.table4(spark, bundle)
    assert(rows.map(_._1) === Seq("R1", "R2", "R3", "NoR4", "NoNeighbors"))
    assert(rows.forall(_._2.truthSize === TestKBs.tinyProfile.nMatches))
  }

  test("renderScoresTable shows dashes for unreported paper cells") {
    val rows = Seq("LINDA" -> repro.core.Scores(1, 1, 1, 1, 1, 1))
    val out = Tables.renderScoresTable("Table 3",
      bundle.copy(profile = bundle.profile.copy(name = "yago-imdb-lite")),
      PaperNumbers.table3, rows)
    assert(out.contains("-"))
  }
}
