package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.AMI
import scala.util.Random

class EMGMMSpec extends AnyFunSuite {

  private def gaussians(sep: Double, seed: Long = 1): (Array[Array[Double]], Array[Int]) = {
    val rnd = new Random(seed)
    val x = Array.newBuilder[Array[Double]]
    val y = Array.newBuilder[Int]
    for (c <- 0 until 3; _ <- 0 until 250) {
      x += Array(c * sep + rnd.nextGaussian(), c * sep * 0.5 + rnd.nextGaussian())
      y += c
    }
    (x.result(), y.result())
  }

  test("well-separated Gaussians are perfectly recovered") {
    val (x, y) = gaussians(12.0)
    assert(AMI.ami(y, EMGMM.fit(x, 3).labels) > 0.95)
  }

  test("moderately overlapping Gaussians still score well") {
    val (x, y) = gaussians(5.0)
    assert(AMI.ami(y, EMGMM.fit(x, 3).labels) > 0.6)
  }

  test("weights form a distribution") {
    val (x, _) = gaussians(8.0)
    val m = EMGMM.fit(x, 3)
    assert(math.abs(m.weights.sum - 1.0) < 1e-6)
    assert(m.weights.forall(_ > 0))
  }

  test("variances stay positive") {
    val (x, _) = gaussians(8.0)
    assert(EMGMM.fit(x, 3).vars.flatten.forall(_ > 0))
  }

  test("deterministic given the seed") {
    val (x, _) = gaussians(6.0)
    assert(EMGMM.fit(x, 3, seed = 9).labels.sameElements(EMGMM.fit(x, 3, seed = 9).labels))
  }

  test("k = 1 degenerates to a single component") {
    val (x, _) = gaussians(6.0)
    assert(EMGMM.fit(x, 1).labels.forall(_ == 0))
  }

  test("log-likelihood of the right k beats k = 1") {
    val (x, _) = gaussians(10.0)
    assert(EMGMM.fit(x, 3).logLik > EMGMM.fit(x, 1).logLik)
  }

  test("anisotropic clusters are handled by the diagonal covariance") {
    val rnd = new Random(5)
    val x = Array.newBuilder[Array[Double]]
    val y = Array.newBuilder[Int]
    for (_ <- 0 until 300) { x += Array(rnd.nextGaussian() * 4, rnd.nextGaussian() * 0.2); y += 0 }
    for (_ <- 0 until 300) { x += Array(rnd.nextGaussian() * 4, 6 + rnd.nextGaussian() * 0.2); y += 1 }
    assert(AMI.ami(y.result(), EMGMM.fit(x.result(), 2).labels) > 0.9)
  }
}
