package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.AMI
import scala.util.Random

class STSCSpec extends AnyFunSuite {

  private def blobs(n: Int, seed: Long = 1): (Array[Array[Double]], Array[Int]) = {
    val rnd = new Random(seed)
    val centers = Array((0.0, 0.0), (8.0, 0.0), (4.0, 7.0))
    val x = Array.newBuilder[Array[Double]]
    val y = Array.newBuilder[Int]
    for (c <- centers.indices; _ <- 0 until n) {
      x += Array(centers(c)._1 + rnd.nextGaussian() * 0.5, centers(c)._2 + rnd.nextGaussian() * 0.5)
      y += c
    }
    (x.result(), y.result())
  }

  test("three separated blobs: eigengap selects k = 3 and AMI is 1") {
    val (x, y) = blobs(80)
    val pred = STSC.fit(x)
    assert(pred.distinct.length == 3, s"k=${pred.distinct.length}")
    assert(AMI.ami(y, pred) > 0.95)
  }

  test("two separated blobs select k = 2") {
    val rnd = new Random(2)
    val x = Array.fill(100)(Array(rnd.nextGaussian() * 0.3, rnd.nextGaussian() * 0.3)) ++
            Array.fill(100)(Array(6 + rnd.nextGaussian() * 0.3, rnd.nextGaussian() * 0.3))
    assert(STSC.fit(x).distinct.length == 2)
  }

  test("large inputs take the subsample + 1-NN path and still recover blobs") {
    val (x, y) = blobs(700) // 2100 points > cap 600
    val pred = STSC.fit(x)
    assert(AMI.ami(y, pred) > 0.9)
  }

  test("local scaling separates clusters of different densities") {
    val rnd = new Random(3)
    val x = Array.fill(150)(Array(rnd.nextGaussian() * 0.1, rnd.nextGaussian() * 0.1)) ++
            Array.fill(150)(Array(5 + rnd.nextGaussian() * 1.0, rnd.nextGaussian() * 1.0))
    val y = Array.fill(150)(0) ++ Array.fill(150)(1)
    assert(AMI.ami(y, STSC.fit(x)) > 0.8)
  }

  test("deterministic") {
    val (x, _) = blobs(60, 4)
    assert(STSC.fit(x).sameElements(STSC.fit(x)))
  }

  test("tiny inputs do not crash") {
    assert(STSC.fit(Array(Array(0.0), Array(1.0))).length == 2)
    assert(STSC.fit(Array.empty[Array[Double]]).isEmpty)
  }
}
