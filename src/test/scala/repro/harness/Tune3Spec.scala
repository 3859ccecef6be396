package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.{DipTest, SkinnyDip}
import repro.data.UciLike

/** Scratch: debug SkinnyDip on the Wholesale analogue. */
class Tune3Spec extends AnyFunSuite {
  test("skinnydip on wholesale") {
    assume(sys.env.contains("ADAWAVE_TUNE3"))
    val ds = UciLike.wholesale()
    val x = UciLike.unitScale(ds.x)
    for (dim <- 0 until 3) {
      val vals = x.map(_(dim)).sorted
      val r = DipTest.test(vals)
      println(f"== dim $dim: dip=${r.stat}%.4f p=${r.pValue}%.3f")
      val ivs = SkinnyDip.uniDip(vals, 0.05)
      println(s"   intervals: ${ivs.map { case (a, b) => f"($a%.2f,$b%.2f)" }}")
    }
    val pred = SkinnyDip.fit(x)
    val sizes = pred.groupBy(identity).view.mapValues(_.length).toSeq.sortBy(-_._2)
    println(s"   fit sizes: $sizes")
    import repro.eval.AMI
    println(s"   ami=${AMI.ami(ds.y, Harness.assignNoise(x, pred))}")
  }
}
