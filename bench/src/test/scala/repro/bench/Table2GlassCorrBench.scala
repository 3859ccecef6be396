package repro.bench

import repro.SparkSpec
import repro.harness.GlassCorrHarness

/** Regenerates Table II: per-attribute correlation with class on the Glass
  * analogue — the paper's evidence that no single Glass attribute separates
  * the classes.
  */
class Table2GlassCorrBench extends SparkSpec {

  test("Table II — Glass attribute/class correlations") {
    val cors = GlassCorrHarness.correlations(spark)
    println(GlassCorrHarness.render(cors))
    assert(cors.size == 9)
    // The shape claim: weak attribute-class correlation everywhere (the
    // class signal is spread across dimensions, |corr| far from 1).
    assert(cors.forall { case (_, c) => math.abs(c) < 0.9 })
    assert(cors.count { case (_, c) => math.abs(c) < 0.6 } >= 5,
      s"most attributes should correlate weakly: $cors")
  }
}
