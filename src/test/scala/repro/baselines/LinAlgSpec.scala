package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LinAlgSpec extends AnyFunSuite {

  test("2x2 known eigendecomposition") {
    val a = Array(Array(2.0, 1.0), Array(1.0, 2.0))
    val (vals, _) = LinAlg.symEig(a.map(_.clone()))
    assert(math.abs(vals(0) - 1.0) < 1e-8)
    assert(math.abs(vals(1) - 3.0) < 1e-8)
  }

  test("diagonal matrix returns its diagonal, sorted") {
    val a = Array(Array(5.0, 0.0, 0.0), Array(0.0, -1.0, 0.0), Array(0.0, 0.0, 2.0))
    val (vals, _) = LinAlg.symEig(a.map(_.clone()))
    assert(vals.toSeq.map(v => math.round(v * 1e6) / 1e6) == Seq(-1.0, 2.0, 5.0))
  }

  test("A v = lambda v on a random symmetric matrix") {
    val rnd = new Random(1)
    val n = 20
    val m = Array.tabulate(n, n)((_, _) => rnd.nextGaussian())
    val a = Array.tabulate(n, n)((i, j) => (m(i)(j) + m(j)(i)) / 2)
    val (vals, vecs) = LinAlg.symEig(a.map(_.clone()))
    for (c <- 0 until n) {
      val v = Array.tabulate(n)(vecs(_)(c))
      val av = Array.tabulate(n)(i => (0 until n).map(j => a(i)(j) * v(j)).sum)
      val err = av.zip(v).map { case (x, y) => math.abs(x - vals(c) * y) }.max
      assert(err < 1e-6, s"column $c residual $err")
    }
  }

  test("eigenvectors are orthonormal") {
    val rnd = new Random(2)
    val n = 12
    val m = Array.tabulate(n, n)((_, _) => rnd.nextGaussian())
    val a = Array.tabulate(n, n)((i, j) => (m(i)(j) + m(j)(i)) / 2)
    val (_, vecs) = LinAlg.symEig(a.map(_.clone()))
    for (c1 <- 0 until n; c2 <- c1 until n) {
      val dot = (0 until n).map(i => vecs(i)(c1) * vecs(i)(c2)).sum
      val expect = if (c1 == c2) 1.0 else 0.0
      assert(math.abs(dot - expect) < 1e-7, s"($c1,$c2) dot=$dot")
    }
  }

  test("eigenvalues are returned ascending") {
    val rnd = new Random(3)
    val n = 15
    val m = Array.tabulate(n, n)((_, _) => rnd.nextGaussian())
    val a = Array.tabulate(n, n)((i, j) => (m(i)(j) + m(j)(i)) / 2)
    val (vals, _) = LinAlg.symEig(a.map(_.clone()))
    assert(vals.toSeq == vals.toSeq.sorted)
  }

  test("trace is preserved") {
    val rnd = new Random(4)
    val n = 10
    val m = Array.tabulate(n, n)((_, _) => rnd.nextGaussian())
    val a = Array.tabulate(n, n)((i, j) => (m(i)(j) + m(j)(i)) / 2)
    val trace = (0 until n).map(i => a(i)(i)).sum
    val (vals, _) = LinAlg.symEig(a.map(_.clone()))
    assert(math.abs(vals.sum - trace) < 1e-8)
  }

  test("distance helpers") {
    assert(LinAlg.sqDist(Array(0.0, 0.0), Array(3.0, 4.0)) == 25.0)
    assert(LinAlg.dist(Array(0.0, 0.0), Array(3.0, 4.0)) == 5.0)
  }

  test("1x1 matrix") {
    val (vals, vecs) = LinAlg.symEig(Array(Array(7.0)))
    assert(vals(0) == 7.0 && vecs(0)(0) == 1.0)
  }
}
