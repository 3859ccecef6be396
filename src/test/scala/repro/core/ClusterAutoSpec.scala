package repro.core

import repro.SparkSpec
import repro.data.ClusterData
import repro.eval.AMI
import scala.util.Random

class ClusterAutoSpec extends SparkSpec {

  test("coarsen merges dyadic children and preserves total mass") {
    val cells = Map(Vector(4, 5) -> 2.0, Vector(5, 4) -> 3.0, Vector(5, 5) -> 1.0,
                    Vector(8, 0) -> 7.0)
    val c = AdaWave.coarsen(cells)
    assert(c == Map(Vector(2, 2) -> 6.0, Vector(4, 0) -> 7.0))
    assert(c.values.sum == cells.values.sum)
  }

  test("coarsen twice equals a two-level shift") {
    val rnd = new Random(1)
    val cells = (0 until 100).map(_ => Vector(rnd.nextInt(64), rnd.nextInt(64)) -> 1.0)
      .groupMapReduce(_._1)(_._2)(_ + _)
    val twice = AdaWave.coarsen(AdaWave.coarsen(cells))
    assert(twice.keySet == cells.keySet.map(_.map(_ >> 2)))
    assert(math.abs(twice.values.sum - cells.values.sum) < 1e-9)
  }

  test("clusterAuto on 2-D equals the paper-default cluster() path") {
    val rnd = new Random(2)
    val x = Array.fill(800)(Array(0.2 + rnd.nextGaussian() * 0.02, 0.3 + rnd.nextGaussian() * 0.02)) ++
            Array.fill(800)(Array(0.8 + rnd.nextGaussian() * 0.02, 0.7 + rnd.nextGaussian() * 0.02))
    val df = ClusterData.toDFn(spark, x, Array.fill(x.length)(0))
    val a = AdaWave.clusterAuto(df, Seq("f0", "f1"), assignNoise = false)
    val b = AdaWave.cluster(df, Seq("f0", "f1"), AdaWaveConfig.auto(2))
    assert(a.threshold == b.threshold)
    assert(a.numClusters == b.numClusters)
  }

  test("clusterAuto recovers tight 5-D blobs at full auto-calibration") {
    val rnd = new Random(3)
    val centers = Array.fill(3)(Array.fill(5)(rnd.nextDouble()))
    val pts = Array.newBuilder[Array[Double]]
    val truth = Array.newBuilder[Int]
    for (c <- 0 until 3; _ <- 0 until 300) {
      pts += Array.tabulate(5)(j => centers(c)(j) + rnd.nextGaussian() * 0.02)
      truth += c + 1
    }
    val x = pts.result()
    val df = ClusterData.toDFn(spark, x, Array.fill(x.length)(0))
    val res = AdaWave.clusterAuto(df, (0 until 5).map(i => s"f$i"), assignNoise = true)
    val pred = Array.ofDim[Int](x.length)
    res.points.select("id", AdaWave.ClusterCol).collect()
      .foreach(r => pred(r.getLong(0).toInt) = r.getInt(1))
    assert(AMI.ami(truth.result(), pred) > 0.9)
  }

  test("clusterAuto coarsens diffuse full-rank data instead of fragmenting it") {
    val rnd = new Random(4)
    // 300 points spread over an 8-D cube: any fine grid would be all
    // singletons; auto-calibration must fall back to a coarse grid.
    val x = Array.fill(300)(Array.fill(8)(rnd.nextDouble()))
    val df = ClusterData.toDFn(spark, x, Array.fill(x.length)(0))
    val res = AdaWave.clusterAuto(df, (0 until 8).map(i => s"f$i"), assignNoise = false)
    assert(res.numClusters >= 1)
    assert(res.points.count() == 300)
  }

  test("clusterAuto is deterministic") {
    val rnd = new Random(5)
    val x = Array.fill(500)(Array.fill(3)(rnd.nextGaussian()))
    val df = ClusterData.toDFn(spark, x, Array.fill(x.length)(0))
    val a = AdaWave.clusterAuto(df, Seq("f0", "f1", "f2"), assignNoise = false)
    val b = AdaWave.clusterAuto(df, Seq("f0", "f1", "f2"), assignNoise = false)
    assert(a.threshold == b.threshold && a.cellLabels == b.cellLabels)
  }
}
