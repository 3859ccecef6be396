package repro.harness

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class GlassCorrSpec extends SparkSpec {

  test("nine attribute correlations are produced, all within [-1, 1]") {
    val cors = GlassCorrHarness.correlations(spark)
    assert(cors.size == 9)
    assert(cors.map(_._1) == GlassCorrHarness.AttrNames)
    assert(cors.forall { case (_, c) => c >= -1.0 && c <= 1.0 })
  }

  test("correlations are deterministic") {
    assert(GlassCorrHarness.correlations(spark) == GlassCorrHarness.correlations(spark))
  }

  test("Spark corr matches DuckDB corr (oracle, Table II pipeline)") {
    val df = GlassCorrHarness.glassDF(spark)
    val sparkDf = df.agg(
      round(corr(col("f0"), col("label").cast("double")), 4) as "c0",
      round(corr(col("f5"), col("label").cast("double")), 4) as "c5")
    val sql =
      """SELECT ROUND(corr(CAST(f0 AS DOUBLE), CAST(label AS DOUBLE)), 4) AS c0,
        |       ROUND(corr(CAST(f5 AS DOUBLE), CAST(label AS DOUBLE)), 4) AS c5
        |FROM glass""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "glass" -> df.select("f0", "f5", "label"))
  }

  test("render shows ours next to the paper's Table II values") {
    val out = GlassCorrHarness.render(GlassCorrHarness.correlations(spark))
    assert(out.contains("TABLE II"))
    assert(out.contains("RI") && out.contains("Fe"))
    assert(out.contains("-0.7447")) // the paper's Mg value
  }
}
