package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class DipTestSpec extends AnyFunSuite {

  test("evenly spaced sample attains the known minimum dip 1/(2n)") {
    val x = Array.tabulate(100)(_.toDouble)
    assert(math.abs(DipTest.dip(x).stat - 0.005) < 1e-9)
  }

  test("half mass at each of two points approaches the maximal dip 0.25") {
    val x = Array.fill(50)(0.0) ++ Array.fill(50)(1.0)
    assert(math.abs(DipTest.dip(x).stat - 0.25) < 0.01)
  }

  test("dip grows with bimodal separation") {
    val rnd = new Random(1)
    def bimodal(sep: Double): Array[Double] =
      Array.fill(400)(rnd.nextGaussian() * 0.5) ++ Array.fill(400)(sep + rnd.nextGaussian() * 0.5)
    val near = DipTest.dip(bimodal(1.0)).stat
    val far = DipTest.dip(bimodal(6.0)).stat
    assert(far > near)
  }

  test("clearly bimodal data is significant at alpha = 0.05") {
    val rnd = new Random(2)
    val x = Array.fill(300)(rnd.nextGaussian() * 0.3) ++
            Array.fill(300)(5.0 + rnd.nextGaussian() * 0.3)
    val r = DipTest.test(x)
    assert(r.stat > 0.05)
    assert(r.pValue < 0.05, s"p=${r.pValue}")
  }

  test("a unimodal Gaussian sample is not significant") {
    val rnd = new Random(3)
    val x = Array.fill(500)(rnd.nextGaussian())
    val r = DipTest.test(x)
    assert(r.pValue >= 0.05, s"p=${r.pValue}, dip=${r.stat}")
  }

  test("a uniform sample has a small dip statistic") {
    val rnd = new Random(4)
    val x = Array.fill(500)(rnd.nextDouble())
    assert(DipTest.dip(x).stat < 0.05)
  }

  test("dip is invariant under affine transforms of x") {
    val rnd = new Random(5)
    val x = Array.fill(200)(rnd.nextGaussian()) ++ Array.fill(200)(4 + rnd.nextGaussian())
    val a = DipTest.dip(x).stat
    val b = DipTest.dip(x.map(v => 3.0 * v - 7.0)).stat
    assert(math.abs(a - b) < 1e-9)
  }

  test("dip stays within its theoretical range (1/(2n), 0.25]") {
    val rnd = new Random(6)
    for (trial <- 0 until 10) {
      val n = 50 + trial * 37
      val x = Array.fill(n)(rnd.nextDouble() * 10)
      val d = DipTest.dip(x).stat
      assert(d >= 0.5 / n - 1e-12 && d <= 0.2501, s"n=$n dip=$d")
    }
  }

  test("modal interval of a bimodal sample sits inside the data range") {
    val rnd = new Random(7)
    val x = Array.fill(300)(rnd.nextGaussian() * 0.2) ++
            Array.fill(300)(3.0 + rnd.nextGaussian() * 0.2)
    val d = DipTest.dip(x)
    assert(d.modalLo <= d.modalHi)
    assert(d.modalLo >= x.min && d.modalHi <= x.max)
  }

  test("large inputs are thinned and still behave") {
    val rnd = new Random(8)
    val x = Array.fill(20000)(rnd.nextGaussian())
    val r = DipTest.test(x)
    assert(r.stat < 0.03)
    assert(r.pValue > 0.01)
  }

  test("p-values are deterministic (cached bootstrap null)") {
    val rnd = new Random(9)
    val x = Array.fill(400)(rnd.nextDouble())
    assert(DipTest.test(x).pValue == DipTest.test(x).pValue)
  }

  test("degenerate inputs do not crash") {
    assert(DipTest.dip(Array.empty[Double]).stat == 0.0)
    assert(DipTest.dip(Array(1.0)).stat == 0.5)
    assert(DipTest.dip(Array.fill(10)(2.0)).stat == 0.05) // single atom: 1/(2n)
  }

  test("trimodal data has a large dip too") {
    val rnd = new Random(10)
    val x = Array.fill(200)(rnd.nextGaussian() * 0.2) ++
            Array.fill(200)(3.0 + rnd.nextGaussian() * 0.2) ++
            Array.fill(200)(6.0 + rnd.nextGaussian() * 0.2)
    assert(DipTest.test(x).pValue < 0.05)
  }
}
