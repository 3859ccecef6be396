package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class AMISpec extends AnyFunSuite {

  test("identical partitions score 1") {
    assert(AMI.ami(Array(1, 1, 2, 2, 3), Array(1, 1, 2, 2, 3)) == 1.0)
  }

  test("renamed labels still score 1") {
    val a = Array(0, 0, 1, 1, 2, 2)
    val b = Array(7, 7, 3, 3, 9, 9)
    assert(math.abs(AMI.ami(a, b) - 1.0) < 1e-9)
  }

  test("the classic independent 2x2 example scores -0.5") {
    // Hand-computed: MI=0, EMI=ln2/3, H=ln2 ⇒ AMI = -0.5 (both norms agree).
    val v = AMI.ami(Array(0, 0, 1, 1), Array(0, 1, 0, 1))
    assert(math.abs(v - (-0.5)) < 1e-9)
  }

  test("random labelings score near zero") {
    val rnd = new Random(3)
    val a = Array.fill(2000)(rnd.nextInt(4))
    val b = Array.fill(2000)(rnd.nextInt(4))
    assert(math.abs(AMI.ami(a, b)) < 0.05)
  }

  test("AMI is symmetric") {
    val rnd = new Random(4)
    val a = Array.fill(300)(rnd.nextInt(3))
    val b = Array.fill(300)(rnd.nextInt(5))
    assert(math.abs(AMI.ami(a, b) - AMI.ami(b, a)) < 1e-9)
  }

  test("single cluster vs multi-cluster scores 0") {
    assert(AMI.ami(Array(1, 1, 1, 1), Array(1, 2, 3, 4)) == 0.0)
  }

  test("both single-cluster scores 1 by convention") {
    assert(AMI.ami(Array(1, 1, 1), Array(2, 2, 2)) == 1.0)
  }

  test("partial agreement lands strictly between 0 and 1") {
    val a = Array(1, 1, 1, 1, 2, 2, 2, 2)
    val b = Array(1, 1, 1, 2, 2, 2, 2, 2)
    val v = AMI.ami(a, b)
    assert(v > 0.1 && v < 1.0, s"got $v")
  }

  test("entropy of a balanced two-way split is ln 2") {
    assert(math.abs(AMI.entropy(Array(5L, 5L), 10L) - math.log(2)) < 1e-12)
  }

  test("mutual information of identical balanced partitions equals the entropy") {
    val cont = Array(Array(5L, 0L), Array(0L, 5L))
    val mi = AMI.mutualInfo(cont, Array(5L, 5L), Array(5L, 5L), 10L)
    assert(math.abs(mi - math.log(2)) < 1e-12)
  }

  test("expected MI is positive for dependent-capable marginals") {
    assert(AMI.expectedMI(Array(2L, 2L), Array(2L, 2L), 4L) > 0)
  }

  test("expected MI shrinks as n grows (finite-size effect)") {
    val small = AMI.expectedMI(Array(5L, 5L), Array(5L, 5L), 10L)
    val large = AMI.expectedMI(Array(500L, 500L), Array(500L, 500L), 1000L)
    assert(large < small)
  }

  test("amiNonNoise ignores points whose true label is noise") {
    val truth = Array(0, 0, 1, 1, 2, 2) // 0 = noise
    val predA = Array(9, 8, 5, 5, 6, 6) // junk on noise, perfect elsewhere
    assert(math.abs(AMI.amiNonNoise(truth, predA, 0) - 1.0) < 1e-9)
  }

  test("amiNonNoise penalizes clusters merged on non-noise points") {
    val truth = Array(0, 1, 1, 2, 2)
    val pred = Array(1, 1, 1, 1, 1)
    assert(AMI.amiNonNoise(truth, pred, 0) == 0.0)
  }

  test("mismatched lengths are rejected") {
    intercept[IllegalArgumentException] { AMI.ami(Array(1), Array(1, 2)) }
  }

  test("empty input scores 0") {
    assert(AMI.ami(Array.empty[Int], Array.empty[Int]) == 0.0)
  }

  test("agreement beats chance on a noisy copy") {
    val rnd = new Random(6)
    val a = Array.fill(1000)(rnd.nextInt(4))
    val b = a.map(l => if (rnd.nextDouble() < 0.2) rnd.nextInt(4) else l)
    val v = AMI.ami(a, b)
    assert(v > 0.3 && v < 1.0, s"got $v")
  }
}
