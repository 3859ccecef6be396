package repro.harness

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core._
import repro.data.ClusterData

/** Shared plumbing for the table harnesses: run every clustering method of
  * the paper on a driver-side point array (plus the Spark pipeline for
  * AdaWave) and return predicted labels aligned with the input order.
  */
object Harness {

  /** AdaWave via the Spark pipeline; returns labels in input row order. */
  def adaWave(spark: SparkSession, x: Array[Array[Double]], cfg: AdaWaveConfig): Array[Int] = {
    val (df, cols) = toDF(spark, x)
    collectLabels(AdaWave.cluster(df, cols, cfg), x.length)
  }

  /** Parameter-free AdaWave (auto-calibrated resolution, see clusterAuto). */
  def adaWaveAuto(spark: SparkSession, x: Array[Array[Double]], assignNoise: Boolean): Array[Int] = {
    val (df, cols) = toDF(spark, x)
    collectLabels(AdaWave.clusterAuto(df, cols, assignNoise), x.length)
  }

  private def toDF(spark: SparkSession, x: Array[Array[Double]]) = {
    val d = x.headOption.map(_.length).getOrElse(0)
    (ClusterData.toDFn(spark, x, Array.fill(x.length)(0)), (0 until d).map(i => s"f$i"))
  }

  private def collectLabels(res: repro.core.AdaWaveResult, n: Int): Array[Int] = {
    val out = Array.ofDim[Int](n)
    res.points.select("id", AdaWave.ClusterCol).collect()
      .foreach(r => out(r.getLong(0).toInt) = r.getInt(1))
    out
  }

  /** Nearest-centroid assignment of noise (label 0) points — the paper's
    * UCI protocol, applied to every method that emits a noise label so the
    * comparison stays apples-to-apples.
    */
  def assignNoise(x: Array[Array[Double]], labels: Array[Int]): Array[Int] = {
    val ids = labels.distinct.filter(_ != 0)
    if (ids.isEmpty) return labels
    val d = x(0).length
    val centroids = ids.map { c =>
      val members = labels.indices.filter(labels(_) == c)
      val ctr = Array.ofDim[Double](d)
      for (i <- members; j <- 0 until d) ctr(j) += x(i)(j) / members.length
      c -> ctr
    }
    labels.indices.map { i =>
      if (labels(i) != 0) labels(i)
      else centroids.minBy { case (_, ctr) => LinAlg.sqDist(x(i), ctr) }._1
    }.toArray
  }

  /** DBSCAN at the best AMI over an ε grid (the paper's protocol:
    * minPts = 8, ε ∈ grid, report the best run). Large high-dimensional
    * inputs are clustered on a deterministic sample and extended by 1-NN.
    */
  def dbscanBest(x: Array[Array[Double]], truth: Array[Int], epsGrid: Seq[Double],
                 minPts: Int = 8, score: (Array[Int], Array[Int]) => Double,
                 cap: Int = 6000, seed: Long = 42): (Array[Int], Double) = {
    val d = x(0).length
    val (xs, restore): (Array[Array[Double]], Array[Int] => Array[Int]) =
      if (d > 6 && x.length > cap) {
        val rnd = new scala.util.Random(seed)
        val idx = rnd.shuffle(x.indices.toVector).take(cap).toArray.sorted
        val sample = idx.map(x(_))
        (sample, sub => extend1NN(x, idx, sample, sub))
      } else (x, identity[Array[Int]] _)
    var best: (Array[Int], Double) = (Array.fill(x.length)(1), Double.NegativeInfinity)
    for (eps <- epsGrid) {
      val full = restore(DBSCAN.fit(xs, eps, minPts))
      val s = score(truth, full)
      if (s > best._2) best = (full, s)
    }
    best
  }

  def extend1NN(x: Array[Array[Double]], sampleIdx: Array[Int],
                sample: Array[Array[Double]], sampleLabels: Array[Int]): Array[Int] = {
    Array.tabulate(x.length) { i =>
      var bestJ = 0
      var bestD = Double.MaxValue
      for (j <- sample.indices) {
        val dd = LinAlg.sqDist(x(i), sample(j))
        if (dd < bestD) { bestD = dd; bestJ = j }
      }
      sampleLabels(bestJ)
    }
  }

  def timeMs[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1e6)
  }

  /** Render rows as a fixed-width table (also valid Markdown-ish). */
  def formatTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }
}
