package repro.bench

import repro.SparkSpec
import repro.data.DatasetProfile
import repro.harness.Tables

/** Reproduces Table 2 (block statistics): shared name/token block counts,
  * suggested comparisons, and blocking precision/recall/F1.
  *
  * Asserted shape (as in the paper): token-block comparisons dominate name
  * blocks by ≥1 order of magnitude, total comparisons sit well below the
  * Cartesian product, and blocking recall is near-perfect while precision
  * is very low.
  */
class Table2Bench extends SparkSpec {

  test("Table 2 — block statistics (all profiles)") {
    for (p <- DatasetProfile.all) {
      val b = Tables.bundle(spark, p)
      val s = Tables.table2(b)
      println(Tables.renderTable2(b, s))

      assert(s.tokenComparisons > 5 * s.nameComparisons,
        s"${p.name}: ||B_T||=${s.tokenComparisons} vs ||B_N||=${s.nameComparisons}")
      assert(s.tokenComparisons + s.nameComparisons < s.cartesian / 5,
        s"${p.name}: comparisons not far below Cartesian")
      assert(s.recall > 95.0, s"${p.name}: blocking recall ${s.recall}")
      assert(s.precision < 50.0, s"${p.name}: blocking precision ${s.precision}")
      Tables.releaseBundle(b)
    }
  }
}
