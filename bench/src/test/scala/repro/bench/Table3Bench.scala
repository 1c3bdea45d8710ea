package repro.bench

import repro.SparkSpec
import repro.data.DatasetProfile
import repro.harness.{PaperNumbers, Tables}

/** Reproduces Table 3 (MinoanER vs state-of-the-art + the fine-tuned BSL).
  *
  * Asserted shape, matching the paper's conclusions:
  *  - low-Variety pairs (restaurant, rexa-dblp): everything value-based is
  *    strong; MinoanER is at least competitive;
  *  - bbcmusic-dbpedia (high Variety): MinoanER ≫ BSL ≫ PARIS;
  *  - yago-imdb (low value similarity, structural regularity): MinoanER and
  *    PARIS are strong, BSL collapses.
  */
class Table3Bench extends SparkSpec {

  private val results = scala.collection.mutable.Map.empty[(String, String), repro.core.Scores]

  private def run(profileName: String): Unit = {
    val p = DatasetProfile.byName(profileName)
    val b = Tables.bundle(spark, p)
    val rows = Tables.table3(spark, b)
    rows.foreach { case (sys, s) => results((profileName, sys)) = s }
    println(Tables.renderScoresTable("Table 3", b, PaperNumbers.table3, rows))
    Tables.releaseBundle(b)
  }

  private def f1(profile: String, sys: String): Double = results((profile, sys)).f1

  test("Table 3 — restaurant-lite: every system strong, MinoanER ~perfect") {
    run("restaurant-lite")
    assert(f1("restaurant-lite", "MinoanER") > 0.9)
    assert(f1("restaurant-lite", "BSL") > 0.9)
    assert(f1("restaurant-lite", "SiGMa") > 0.8)
    assert(f1("restaurant-lite", "PARIS") > 0.7)
  }

  test("Table 3 — rexa-dblp-lite: MinoanER at least on par with iterative tools") {
    run("rexa-dblp-lite")
    assert(f1("rexa-dblp-lite", "MinoanER") > 0.85)
    assert(f1("rexa-dblp-lite", "MinoanER") >= f1("rexa-dblp-lite", "RiMOM") - 0.05)
    assert(f1("rexa-dblp-lite", "BSL") > 0.6)
  }

  test("Table 3 — bbcmusic-dbpedia-lite: MinoanER >> BSL >> PARIS") {
    run("bbcmusic-dbpedia-lite")
    val minoan = f1("bbcmusic-dbpedia-lite", "MinoanER")
    val bsl = f1("bbcmusic-dbpedia-lite", "BSL")
    val paris = f1("bbcmusic-dbpedia-lite", "PARIS")
    assert(minoan > 0.7, s"MinoanER $minoan")
    assert(minoan > bsl + 0.15, s"MinoanER $minoan vs BSL $bsl")
    assert(bsl > paris, s"BSL $bsl vs PARIS $paris")
    assert(paris < 0.35, s"PARIS $paris should collapse under surface noise")
  }

  test("Table 3 — yago-imdb-lite: MinoanER ~ PARIS ~ SiGMa >> BSL") {
    run("yago-imdb-lite")
    val minoan = f1("yago-imdb-lite", "MinoanER")
    val paris = f1("yago-imdb-lite", "PARIS")
    val bsl = f1("yago-imdb-lite", "BSL")
    assert(minoan > 0.7, s"MinoanER $minoan")
    assert(paris > 0.6, s"PARIS $paris")
    assert(minoan > bsl + 0.2, s"MinoanER $minoan vs BSL $bsl")
    assert(paris > bsl, s"PARIS $paris vs BSL $bsl")
  }
}
