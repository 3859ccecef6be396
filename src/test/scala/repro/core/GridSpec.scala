package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class GridSpec extends SparkSpec {

  private def df2(pts: Seq[(Double, Double)]) = {
    import spark.implicits._
    pts.toDF("x", "y")
  }

  test("quantize assigns known points to the expected cells") {
    val q = Grid.quantize(df2(Seq((0.0, 0.0), (0.99, 0.99), (0.5, 0.25))), Seq("x", "y"), 4)
    // widths = 0.99/4 = 0.2475; 0.5/0.2475 = 2.02 → bin 2; 0.25/0.2475 → 1
    assert(q.cells(Vector(0, 0)) == 1.0)
    assert(q.cells(Vector(3, 3)) == 1.0)
    assert(q.cells(Vector(2, 1)) == 1.0)
  }

  test("the maximum value is clamped into the last bin") {
    val q = Grid.quantize(df2(Seq((0.0, 0.0), (1.0, 1.0))), Seq("x", "y"), 8)
    assert(q.cells(Vector(7, 7)) == 1.0)
  }

  test("constant dimensions collapse to bin 0 without dividing by zero") {
    val q = Grid.quantize(df2(Seq((5.0, 1.0), (5.0, 2.0), (5.0, 3.0))), Seq("x", "y"), 4)
    assert(q.cells.keys.forall(_.head == 0))
    assert(q.widths(0) == 1.0)
  }

  test("cell densities sum to the number of points") {
    val pts = (0 until 500).map(i => (math.sin(i * 0.37) + 1, math.cos(i * 0.53) + 1))
    val q = Grid.quantize(df2(pts), Seq("x", "y"), 16)
    assert(q.cells.values.sum == 500.0)
  }

  test("only non-empty cells are stored (sparse grid labeling)") {
    val q = Grid.quantize(df2(Seq((0.0, 0.0), (1.0, 1.0))), Seq("x", "y"), 128)
    assert(q.cells.size == 2) // not 128², the paper's memory argument
  }

  test("points DataFrame carries the __cell column aligned with inputs") {
    val q = Grid.quantize(df2(Seq((0.0, 0.0), (1.0, 1.0))), Seq("x", "y"), 4)
    val cells = q.points.select(Grid.CellCol).collect().map(_.getSeq[Int](0).toVector)
    assert(cells.toSet == Set(Vector(0, 0), Vector(3, 3)))
  }

  test("quantization is deterministic") {
    val pts = (0 until 200).map(i => (i * 0.017 % 1.0, i * 0.031 % 1.0))
    val a = Grid.quantize(df2(pts), Seq("x", "y"), 32).cells
    val b = Grid.quantize(df2(pts), Seq("x", "y"), 32).cells
    assert(a == b)
  }

  test("bins < 2 is rejected") {
    intercept[IllegalArgumentException] { Grid.quantize(df2(Seq((0.0, 0.0))), Seq("x", "y"), 1) }
  }

  test("grid densities match DuckDB (oracle)") {
    val pts = (0 until 300).map(i => (math.sin(i * 0.7) * 3 + 3, (i % 17) * 0.21))
    val raw = df2(pts)
    val q = Grid.quantize(raw, Seq("x", "y"), 8)
    val sparkDf = q.points
      .select(col(Grid.CellCol)(0) as "gx", col(Grid.CellCol)(1) as "gy")
      .groupBy("gx", "gy")
      .agg(count(lit(1)) as "cnt")
    val sql =
      s"""SELECT
         |  LEAST(7, GREATEST(0, CAST(FLOOR((CAST(x AS DOUBLE) - ${q.mins(0)}) / ${q.widths(0)}) AS INT))) AS gx,
         |  LEAST(7, GREATEST(0, CAST(FLOOR((CAST(y AS DOUBLE) - ${q.mins(1)}) / ${q.widths(1)}) AS INT))) AS gy,
         |  COUNT(*) AS cnt
         |FROM pts GROUP BY 1, 2""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "pts" -> raw)
  }

  test("3-D quantization produces 3-coordinate cells") {
    import spark.implicits._
    val df = (0 until 50).map(i => (i * 0.02, 1 - i * 0.02, (i % 5) * 0.2)).toDF("a", "b", "c")
    val q = Grid.quantize(df, Seq("a", "b", "c"), 4)
    assert(q.cells.keys.forall(_.size == 3))
    assert(q.cells.values.sum == 50.0)
  }
}
