package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.util.Random

/** The paper's synthetic evaluation dataset (§V-B): five 2-D clusters of
  * equal size inside the unit square — an approximately rectangular blob
  * (uniform rectangle + Gaussian σ=0.005 jitter), two overlapping discs
  * (overlapping in both the x and y projections), and two concentric rings
  * ("parallel lines ... circular in concentric distribution") — plus a
  * γ-fraction of uniform noise over the unit square.
  *
  * Labels: 0 = noise, 1..5 = clusters. Deterministic in (clusterSize, γ,
  * seed), so Spark and driver-side consumers see identical data.
  */
object ClusterData {

  val NoiseLabel = 0
  val NumClusters = 5

  def runningExample(clusterSize: Int = 5600, noiseFrac: Double = 0.5,
                     seed: Long = 7): (Array[Array[Double]], Array[Int]) = {
    require(noiseFrac >= 0 && noiseFrac < 1)
    val rnd = new Random(seed)
    val pts = Array.newBuilder[Array[Double]]
    val lbl = Array.newBuilder[Int]

    def add(label: Int, p: Array[Double]): Unit = { pts += p; lbl += label }

    // Shapes are compact (≈9 % of the unit square) so that at high noise
    // the uniform clutter dominates any SSE/likelihood landscape — the
    // regime of the paper's Fig. 7.
    // 1: rectangular blob.
    for (_ <- 0 until clusterSize)
      add(1, Array(0.10 + rnd.nextDouble() * 0.16 + rnd.nextGaussian() * 0.005,
                   0.76 + rnd.nextDouble() * 0.08 + rnd.nextGaussian() * 0.005))
    // 2, 3: spatially disjoint discs whose x and y projections overlap
    // (the arrangement that defeats per-axis unimodal methods).
    for (_ <- 0 until clusterSize) add(2, disc(rnd, 0.62, 0.74, 0.068))
    for (_ <- 0 until clusterSize) add(3, disc(rnd, 0.74, 0.62, 0.068))
    // 4, 5: concentric rings.
    for (_ <- 0 until clusterSize) add(4, ring(rnd, 0.30, 0.30, 0.080, 0.008))
    for (_ <- 0 until clusterSize) add(5, ring(rnd, 0.30, 0.30, 0.145, 0.008))

    val nCluster = NumClusters * clusterSize
    val nNoise = math.round(nCluster * noiseFrac / (1.0 - noiseFrac)).toInt
    for (_ <- 0 until nNoise)
      add(NoiseLabel, Array(rnd.nextDouble(), rnd.nextDouble()))

    (pts.result(), lbl.result())
  }

  private def disc(rnd: Random, cx: Double, cy: Double, r: Double): Array[Double] = {
    val rr = r * math.sqrt(rnd.nextDouble())
    val th = rnd.nextDouble() * 2 * math.Pi
    Array(cx + rr * math.cos(th), cy + rr * math.sin(th))
  }

  private def ring(rnd: Random, cx: Double, cy: Double, r: Double, sigma: Double): Array[Double] = {
    val rr = r + rnd.nextGaussian() * sigma
    val th = rnd.nextDouble() * 2 * math.Pi
    Array(cx + rr * math.cos(th), cy + rr * math.sin(th))
  }

  /** (x, y, label) rows as a DataFrame for the Spark-side pipeline. */
  def toDF(spark: SparkSession, x: Array[Array[Double]], labels: Array[Int]): DataFrame = {
    import spark.implicits._
    x.zip(labels).toSeq.map { case (p, l) => (p(0), p(1), l) }.toDF("x", "y", "label")
  }

  /** Arbitrary-dimension variant of [[toDF]] with columns f0..f{d-1},
    * label, and a stable row id for re-aligning collected results.
    */
  def toDFn(spark: SparkSession, x: Array[Array[Double]], labels: Array[Int]): DataFrame = {
    import org.apache.spark.sql.Row
    import org.apache.spark.sql.types._
    val d = x.headOption.map(_.length).getOrElse(0)
    val schema = StructType(
      (0 until d).map(i => StructField(s"f$i", DoubleType)) :+
        StructField("label", IntegerType) :+ StructField("id", LongType))
    val rows = x.indices.map(i => Row.fromSeq(x(i).toSeq :+ labels(i) :+ i.toLong))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 8), schema)
  }
}
