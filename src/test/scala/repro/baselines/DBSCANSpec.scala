package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.AMI
import scala.util.Random

class DBSCANSpec extends AnyFunSuite {

  private def twoBlobsNoise(seed: Long = 1): (Array[Array[Double]], Array[Int]) = {
    val rnd = new Random(seed)
    val x = Array.newBuilder[Array[Double]]
    val y = Array.newBuilder[Int]
    for (_ <- 0 until 300) { x += Array(0.2 + rnd.nextGaussian() * 0.02, 0.2 + rnd.nextGaussian() * 0.02); y += 1 }
    for (_ <- 0 until 300) { x += Array(0.8 + rnd.nextGaussian() * 0.02, 0.8 + rnd.nextGaussian() * 0.02); y += 2 }
    for (_ <- 0 until 60) { x += Array(rnd.nextDouble(), rnd.nextDouble()); y += 0 }
    (x.result(), y.result())
  }

  test("two dense blobs in sparse noise are found") {
    val (x, y) = twoBlobsNoise()
    val labels = DBSCAN.fit(x, eps = 0.03, minPts = 8)
    assert(AMI.amiNonNoise(y, labels, 0) > 0.9)
    assert(labels.distinct.count(_ != 0) == 2)
  }

  test("tiny eps marks everything noise") {
    val (x, _) = twoBlobsNoise()
    assert(DBSCAN.fit(x, eps = 1e-6, minPts = 8).forall(_ == DBSCAN.Noise))
  }

  test("huge eps merges everything into one cluster") {
    val (x, _) = twoBlobsNoise()
    val labels = DBSCAN.fit(x, eps = 2.0, minPts = 8)
    assert(labels.distinct.length == 1 && labels(0) != DBSCAN.Noise)
  }

  test("ring and blob are both recovered (shape insensitivity)") {
    val rnd = new Random(2)
    val x = Array.newBuilder[Array[Double]]
    val y = Array.newBuilder[Int]
    for (_ <- 0 until 600) {
      val th = rnd.nextDouble() * 2 * math.Pi
      val r = 0.3 + rnd.nextGaussian() * 0.01
      x += Array(0.5 + r * math.cos(th), 0.5 + r * math.sin(th)); y += 1
    }
    for (_ <- 0 until 400) { x += Array(0.5 + rnd.nextGaussian() * 0.02, 0.5 + rnd.nextGaussian() * 0.02); y += 2 }
    val labels = DBSCAN.fit(x.result(), eps = 0.05, minPts = 5)
    assert(AMI.ami(y.result(), labels) > 0.9)
  }

  test("noise points are labeled 0") {
    val (x, y) = twoBlobsNoise()
    val labels = DBSCAN.fit(x, eps = 0.03, minPts = 8)
    val noiseIdx = y.indices.filter(y(_) == 0)
    assert(noiseIdx.count(labels(_) == DBSCAN.Noise) > noiseIdx.size / 2)
  }

  test("bucket-index path agrees with the full-scan path") {
    val (x2, _) = twoBlobsNoise(3)
    // Same points embedded in 7-D (extra zero coords) force the full scan.
    val x7 = x2.map(p => p ++ Array.fill(5)(0.0))
    val a = DBSCAN.fit(x2, eps = 0.03, minPts = 8)
    val b = DBSCAN.fit(x7, eps = 0.03, minPts = 8)
    assert(AMI.ami(a, b) > 0.999)
  }

  test("deterministic across runs") {
    val (x, _) = twoBlobsNoise(4)
    assert(DBSCAN.fit(x, 0.03, 8).sameElements(DBSCAN.fit(x, 0.03, 8)))
  }

  test("empty input yields empty labels") {
    assert(DBSCAN.fit(Array.empty[Array[Double]], 0.1, 3).isEmpty)
  }

  test("minPts larger than any neighbourhood marks all points noise") {
    val (x, _) = twoBlobsNoise(5)
    assert(DBSCAN.fit(x, eps = 0.01, minPts = 5000).forall(_ == DBSCAN.Noise))
  }
}
