package repro.bench

import repro.SparkSpec
import repro.data.DatasetProfile
import repro.harness.Tables

/** Reproduces Table 1 (dataset statistics) over the four synthetic dataset
  * analogues and prints paper-vs-measured rows. Absolute entity/triple
  * counts are scaled down by design (see DESIGN.md §2); the asserted shape
  * is the relative structure: KB-size imbalance, token-set imbalance and
  * schema-heterogeneity ordering.
  */
class Table1Bench extends SparkSpec {

  test("Table 1 — dataset statistics (all profiles)") {
    for (p <- DatasetProfile.all) {
      val b = Tables.bundle(spark, p)
      val r = Tables.table1(b)
      println(Tables.renderTable1(b, r))

      // profile-configured sizes hold exactly
      assert(r.stats1.entities === p.n1)
      assert(r.stats2.entities === p.n2)
      assert(r.matches === p.nMatches)

      p.name match {
        case "rexa-dblp-lite" =>
          // heavy KB-size imbalance, KB2 more verbose
          assert(r.stats2.entities > 10 * r.stats1.entities)
          assert(r.stats2.avgTokens > r.stats1.avgTokens)
        case "bbcmusic-dbpedia-lite" =>
          // ~4x token-set imbalance and extreme attribute heterogeneity
          assert(r.stats2.avgTokens > 2.5 * r.stats1.avgTokens)
          assert(r.stats2.attributes > 5 * r.stats1.attributes)
        case "yago-imdb-lite" =>
          // balanced sizes, terse descriptions
          assert(math.abs(r.stats1.entities - r.stats2.entities) <= p.n1 / 2)
          assert(r.stats1.avgTokens < 25 && r.stats2.avgTokens < 25)
        case _ => ()
      }
      Tables.releaseBundle(b)
    }
  }
}
