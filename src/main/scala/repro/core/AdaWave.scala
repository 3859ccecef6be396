package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.sql.expressions.UserDefinedFunction

/** Configuration of the AdaWave pipeline.
  *
  * The paper presents AdaWave as parameter-free; [[AdaWaveConfig.auto]]
  * encodes its defaults (`scale = 128` for 2-D, §V-B) plus a dimension-aware
  * fallback for higher-dimensional data where 128 bins per dimension would
  * put every point in its own cell.
  *
  * @param bins        bins per dimension (the paper's `scale`)
  * @param levels      wavelet decomposition levels (average subband only)
  * @param family      wavelet family (analysis low-pass filter)
  * @param diagonal    use the Moore neighbourhood for connected components
  * @param assignNoise after clustering, assign noise points to the nearest
  *                    cluster centroid — the paper does exactly this for the
  *                    real-world (UCI) evaluation where no noise label exists
  */
final case class AdaWaveConfig(
    bins: Int = 128,
    levels: Int = 1,
    family: Wavelet.Family = Wavelet.CDF22,
    diagonal: Boolean = true,
    assignNoise: Boolean = false)

object AdaWaveConfig {

  /** Parameter-free defaults: 128 bins for d ≤ 2 (the paper's `scale`
    * default), otherwise the finest power-of-two grid that (a) keeps the
    * cell fan-out bounded in dimension (2^ceil(16/d)) and (b) — when the
    * row count `n` is supplied — keeps a few points per occupied cell under
    * a low-intrinsic-dimension assumption (≈ √(n/5) bins, at least 8).
    */
  def auto(d: Int, n: Long = 0L, assignNoise: Boolean = false): AdaWaveConfig = {
    // Hat-shaped CDF(2,2) smoothing helps 2-D spatial data; in higher d its
    // 5-tap support fans each cell into ~2.5^d transformed cells and blurs
    // every cluster into one connected mass, so we fall back to Haar. Haar
    // maps every cell to exactly one transformed cell, so the sparse cell
    // count never exceeds n regardless of the bin count — the grid can stay
    // fine in high d and only the per-cell point budget (≈ √(n/5) bins
    // under a low-intrinsic-dimension assumption) caps it.
    val bins =
      if (d <= 2) 128
      else if (n > 0)
        math.min(64, math.max(8, Integer.highestOneBit(math.max(1, math.sqrt(n / 5.0).toInt))))
      else math.max(4, math.min(128, math.pow(2.0, math.ceil(16.0 / d)).toInt))
    val family: Wavelet.Family = if (d <= 2) Wavelet.CDF22 else Wavelet.Haar
    AdaWaveConfig(bins = bins, levels = 1, family = family,
      diagonal = d <= 2, assignNoise = assignNoise)
  }
}

/** Result of an AdaWave run.
  *
  * @param points      input rows + a `cluster` column (0 = noise)
  * @param numClusters number of connected components found
  * @param threshold   the adaptive density threshold that was applied
  * @param cellLabels  transformed-space cell → cluster id
  */
final case class AdaWaveResult(
    points: DataFrame,
    numClusters: Int,
    threshold: Double,
    cellLabels: Map[Vector[Int], Int])

/** AdaWave (Algorithm 1): quantize → wavelet transform → adaptive threshold
  * → connected components → lookup table → point labels.
  *
  * Quantization, density aggregation and the final label join run on Spark;
  * the O(M) sparse-grid stages (M = non-empty cells ≪ N points) run on the
  * driver, mirroring the paper's single-machine formulation. The lookup
  * table (original cell → transformed cell → label) is broadcast implicitly
  * through a UDF closure.
  */
object AdaWave {

  val NoiseLabel = 0
  val ClusterCol = "cluster"

  def cluster(df: DataFrame, cols: Seq[String], cfg: AdaWaveConfig): AdaWaveResult = {
    val q = Grid.quantize(df, cols, cfg.bins)
    run(q, 0, cfg, cols)
  }

  /** Fully parameter-free entry point. For d ≤ 2 this is the paper's
    * default (`scale = 128`, CDF(2,2)). For higher dimensions the grid
    * resolution is auto-calibrated to the data's (unknown) intrinsic
    * dimension: quantize once at a fine 64-bin grid, then merge cells
    * dyadically (a driver-side O(M) fold — Haar cells nest) until the
    * occupied-cell count drops below n/3, i.e. until cells hold enough
    * points for densities to be meaningful.
    */
  def clusterAuto(df: DataFrame, cols: Seq[String], assignNoise: Boolean = false): AdaWaveResult = {
    val d = cols.size
    if (d <= 2)
      return cluster(df, cols, AdaWaveConfig.auto(d, assignNoise = assignNoise))
    val fine = 64
    val q = Grid.quantize(df, cols, fine)
    val n = q.cells.values.sum
    var cells = q.cells
    var shift = 0
    // Look one level ahead: the transform downsamples once more, so the
    // resolution that matters for densities is bins/2.
    while ((fine >> shift) > 4 && coarsen(cells).size > n / 3) {
      cells = coarsen(cells)
      shift += 1
    }
    val cfg = AdaWaveConfig(bins = fine >> shift, levels = 1, family = Wavelet.Haar,
      diagonal = false, assignNoise = assignNoise)
    run(q, shift, cfg, cols)
  }

  /** Merge a sparse cell map one dyadic level coarser (Haar-nested). */
  def coarsen(cells: Map[Vector[Int], Double]): Map[Vector[Int], Double] =
    cells.toSeq.groupMapReduce(_._1.map(_ >> 1))(_._2)(_ + _)

  private def run(q: Quantized, coarsenShift: Int, cfg: AdaWaveConfig,
                  cols: Seq[String]): AdaWaveResult = {
    val d = cols.size
    // Step 1 happened in the caller; apply any auto-calibration coarsening.
    var cells = q.cells
    for (_ <- 0 until coarsenShift) cells = coarsen(cells)

    // Step 2: wavelet decomposition, average subband only.
    val transformed = Wavelet.transform(cells, d, cfg.family, cfg.levels)

    // Step 3: adaptive threshold filtering ("elbow theory"). Negative
    // coefficients (side lobes of the hat filter over noise) are unphysical
    // densities — drop them before the curve is fitted.
    val positive = transformed.filter { case (_, v) => v > 0 }
    val thr = Elbow.threshold(positive.values)
    val kept = positive.collect { case (c, v) if v >= thr => c }.toSet

    // Step 4: connected components in the transformed feature space.
    val labels = ConnectedComponents.label(kept, cfg.diagonal && d <= 8)
    val numClusters = if (labels.isEmpty) 0 else labels.values.max

    // Step 5/6: lookup table original cell → transformed cell → label.
    // Points carry fine-grid cells; shift by coarsening + transform levels.
    val shift = coarsenShift + cfg.levels
    val lookup: Vector[Int] => Int = orig =>
      labels.getOrElse(orig.map(_ >> shift), NoiseLabel)
    val labelUdf: UserDefinedFunction = udf((cell: Seq[Int]) => lookup(cell.toVector))
    var labeled = q.points
      .withColumn(ClusterCol, labelUdf(col(Grid.CellCol)))
      .drop(Grid.CellCol)

    if (cfg.assignNoise && numClusters > 0) labeled = assignNoiseToNearest(labeled, cols)

    AdaWaveResult(labeled, numClusters, thr, labels)
  }

  /** The paper's UCI protocol (§V-C): "we run the k-means iteration on the
    * final AdaWave result to assign any detected noise objects to a 'true'
    * cluster" — i.e. one Lloyd assignment step against the centroids of the
    * discovered clusters.
    */
  def assignNoiseToNearest(labeled: DataFrame, cols: Seq[String]): DataFrame = {
    val centroids: Array[(Int, Array[Double])] = labeled
      .where(col(ClusterCol) =!= NoiseLabel)
      .groupBy(ClusterCol)
      .agg(cols.map(c => avg(col(c)).cast("double").as(c)).head,
           cols.map(c => avg(col(c)).cast("double").as(c)).tail: _*)
      .collect()
      .map(r => r.getInt(0) -> cols.indices.map(i => r.getDouble(i + 1)).toArray)
    if (centroids.isEmpty) return labeled

    val nearest = udf { (label: Int, xs: Seq[Double]) =>
      if (label != NoiseLabel) label
      else centroids.minBy { case (_, ctr) =>
        var s = 0.0
        var i = 0
        while (i < ctr.length) { val dd = xs(i) - ctr(i); s += dd * dd; i += 1 }
        s
      }._1
    }
    labeled.withColumn(ClusterCol,
      nearest(col(ClusterCol), array(cols.map(c => col(c).cast("double")): _*)))
  }
}
