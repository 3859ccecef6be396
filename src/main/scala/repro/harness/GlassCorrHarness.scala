package repro.harness

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.{ClusterData, UciLike}

/** Table II: Pearson correlation of each Glass attribute with the class
  * label, computed with Spark's `corr` aggregate (DuckDB-oracled in tests).
  * The paper uses this to argue Glass is hard: no single attribute
  * separates the classes.
  */
object GlassCorrHarness {

  /** Paper's Table II values, in attribute order RI, Na, Mg, Al, Si, K, Ca, Ba, Fe. */
  val PaperCorr: Seq[Double] =
    Seq(-0.1642, 0.5030, -0.7447, 0.5988, 0.1515, -0.0100, 0.0007, 0.5751, -0.1879)

  val AttrNames: Seq[String] = Seq("RI", "Na", "Mg", "Al", "Si", "K", "Ca", "Ba", "Fe")

  def glassDF(spark: SparkSession): DataFrame = {
    val ds = UciLike.glass()
    ClusterData.toDFn(spark, ds.x, ds.y)
  }

  def correlations(spark: SparkSession): Seq[(String, Double)] = {
    val df = glassDF(spark)
    val d = 9
    val aggs = (0 until d).map(i => corr(col(s"f$i"), col("label").cast("double")).as(s"c$i"))
    val row = df.agg(aggs.head, aggs.tail: _*).head()
    (0 until d).map(i => AttrNames(i) -> row.getDouble(i))
  }

  def render(cors: Seq[(String, Double)]): String = {
    val header = Seq("Attribute", "Correlation (ours)", "Correlation (paper)")
    val rows = cors.zipWithIndex.map { case ((name, c), i) =>
      Seq(name, f"$c%.4f", f"${PaperCorr(i)}%.4f")
    }
    "TABLE II — per-attribute correlation with class (Glass analogue)\n" +
      Harness.formatTable(header, rows)
  }
}
