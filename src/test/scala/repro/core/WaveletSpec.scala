package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}
import repro.core.Wavelet._

class WaveletSpec extends AnyFunSuite {

  private def check(p: Prop, n: Int = 50): Unit =
    assert(SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(n), p).passed)

  test("Haar low-pass sums to 1") { assert(math.abs(Haar.lowPass.sum - 1.0) < 1e-12) }
  test("Daubechies-4 low-pass sums to 1") { assert(math.abs(Daubechies4.lowPass.sum - 1.0) < 1e-12) }
  test("CDF(2,2) low-pass sums to 1") { assert(math.abs(CDF22.lowPass.sum - 1.0) < 1e-12) }
  test("families are exposed with distinct names") {
    assert(families.map(_.name).distinct.size == 3)
  }

  test("dwt1D of a constant signal stays constant in the interior (Haar)") {
    val out = dwt1D(Array.fill(16)(3.0), Haar.lowPass)
    assert(out.length == 8)
    out.foreach(v => assert(math.abs(v - 3.0) < 1e-12))
  }

  test("dwt1D halves the length, rounding up") {
    assert(dwt1D(Array.fill(7)(1.0), Haar.lowPass).length == 4)
    assert(dwt1D(Array.fill(8)(1.0), Haar.lowPass).length == 4)
  }

  test("dwt1D impulse response places h taps at the right outputs (Haar)") {
    val x = Array(0.0, 0.0, 1.0, 0.0, 0.0, 0.0)
    val out = dwt1D(x, Haar.lowPass)
    // x(2) contributes h(0)=0.5 at k=1 only (2k+j=2 → k=1,j=0).
    assert(math.abs(out(1) - 0.5) < 1e-12)
    assert(math.abs(out(0)) < 1e-12 && math.abs(out(2)) < 1e-12)
  }

  test("dwt1D is linear") {
    val gen = Gen.listOfN(12, Gen.chooseNum(-5.0, 5.0)).map(_.toArray)
    check(Prop.forAll(gen, gen) { (a, b) =>
      val sum = a.zip(b).map { case (u, v) => u + 2.5 * v }
      val lhs = dwt1D(sum, CDF22.lowPass)
      val rhs = dwt1D(a, CDF22.lowPass).zip(dwt1D(b, CDF22.lowPass)).map { case (u, v) => u + 2.5 * v }
      lhs.zip(rhs).forall { case (u, v) => math.abs(u - v) < 1e-9 }
    })
  }

  test("sparse transformDim matches dense dwt1D on 1-D grids") {
    val gen = Gen.listOfN(20, Gen.chooseNum(0.0, 9.0)).map(_.toArray)
    check(Prop.forAll(gen) { dense =>
      val sparse: Map[Vector[Int], Double] =
        dense.zipWithIndex.collect { case (v, i) if v != 0.0 => Vector(i) -> v }.toMap
      val out = transformDim(sparse, 0, CDF22.lowPass, CDF22.center)
      val expect = dwt1D(dense, CDF22.lowPass, CDF22.center)
      expect.zipWithIndex.forall { case (v, k) =>
        math.abs(out.getOrElse(Vector(k), 0.0) - v) < 1e-9
      } && out.keys.forall(_.head < expect.length)
    })
  }

  test("sparse transform ignores zero cells entirely") {
    val g = Map(Vector(4) -> 2.0)
    val out = transformDim(g, 0, Haar.lowPass, Haar.center)
    assert(out == Map(Vector(2) -> 1.0))
  }

  test("2-D transform is separable (Haar, product input)") {
    val f = Array(1.0, 2.0, 3.0, 4.0)
    val g = Array(4.0, 3.0, 2.0, 1.0)
    val grid = (for (i <- f.indices; j <- g.indices) yield Vector(i, j) -> f(i) * g(j)).toMap
    val out = transform(grid, 2, Haar, 1)
    val ff = dwt1D(f, Haar.lowPass)
    val gg = dwt1D(g, Haar.lowPass)
    for (i <- ff.indices; j <- gg.indices) {
      val expect = ff(i) * gg(j)
      assert(math.abs(out.getOrElse(Vector(i, j), 0.0) - expect) < 1e-9,
        s"cell ($i,$j): got ${out.get(Vector(i, j))}, want $expect")
    }
  }

  test("Haar transform halves total mass per dimension per level") {
    val grid = (0 until 16).map(i => Vector(i, i % 4) -> (i + 1.0)).toMap
    val out = transform(grid, 2, Haar, 1)
    assert(math.abs(out.values.sum - grid.values.sum * 0.25) < 1e-9)
  }

  test("two levels equal two sequential one-level transforms") {
    val grid = (0 until 32).map(i => Vector(i) -> (math.sin(i / 3.0) + 2.0)).toMap
    val twice = transform(transform(grid, 1, Daubechies4, 1), 1, Daubechies4, 1)
    val once2 = transform(grid, 1, Daubechies4, 2)
    assert(twice.keySet == once2.keySet)
    twice.foreach { case (k, v) => assert(math.abs(once2(k) - v) < 1e-9) }
  }

  test("low-pass smoothing: isolated cell loses mass relative to a dense block") {
    // A 4-cell dense block vs an isolated cell of the same density.
    val block = (8 until 12).map(i => Vector(i) -> 10.0).toMap
    val iso = Map(Vector(20) -> 10.0)
    val out = transform(block ++ iso, 1, CDF22, 1)
    val blockPeak = (4 until 6).map(k => out.getOrElse(Vector(k), 0.0)).max
    val isoPeak = out.getOrElse(Vector(10), 0.0)
    assert(blockPeak > isoPeak, s"block $blockPeak should exceed isolated $isoPeak")
  }

  test("transform output coordinates are the dyadic shift of inputs") {
    val grid = Map(Vector(100, 40) -> 1.0)
    val out = transform(grid, 2, Haar, 1)
    assert(out.keys.forall(c => c(0) == 50 && c(1) == 20))
  }

  test("near-zero coefficients are dropped") {
    val g = Map(Vector(0) -> 1e-13)
    assert(transformDim(g, 0, Haar.lowPass, Haar.center).isEmpty)
  }

  test("boundary cell 0 still contributes (zero padding, no crash)") {
    val out = transformDim(Map(Vector(0) -> 4.0), 0, Haar.lowPass, Haar.center)
    assert(out == Map(Vector(0) -> 2.0))
  }

  test("CDF22 interior mass contribution is one half per point") {
    val g = Map(Vector(10) -> 1.0, Vector(11) -> 1.0)
    val out = transformDim(g, 0, CDF22.lowPass, CDF22.center)
    assert(math.abs(out.values.sum - 1.0) < 1e-9)
  }

  test("d-dimensional transform applies the 1-D pass d times") {
    val grid = Map(Vector(4, 4, 4) -> 8.0)
    val out = transform(grid, 3, Haar, 1)
    // 0.5 per dimension → value 1.0 at (2,2,2).
    assert(math.abs(out(Vector(2, 2, 2)) - 1.0) < 1e-9)
  }
}
