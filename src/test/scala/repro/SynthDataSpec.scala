package repro

/** Sanity coverage for the provided TPC-H-lite generators (kept healthy even
  * though this paper's evaluation uses its own spatial datasets).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("orders keys are dense 1..n") {
    val df = SynthData.orders(spark, sf = 0.001)
    assert(df.count() == 1500L)
    import org.apache.spark.sql.functions._
    val r = df.agg(min("o_orderkey"), max("o_orderkey")).head()
    assert(r.getLong(0) == 1L && r.getLong(1) == 1500L)
  }

  test("customer and part have the advertised shapes") {
    assert(SynthData.customer(spark, sf = 0.01).count() == 1500L)
    assert(SynthData.part(spark, sf = 0.01).columns.length == 4)
  }

  test("zipf keys are skewed: top key exceeds uniform share") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100)
    val top = df.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
      .head().getLong(1)
    assert(top > 20000 / 100 * 3)
  }

  test("uniform keys stay within range") {
    import org.apache.spark.sql.functions._
    val r = SynthData.uniformKeys(spark, 1000, 50).agg(min("k"), max("k")).head()
    assert(r.getLong(0) >= 1L && r.getLong(1) <= 51L)
  }
}
