package repro.harness

import repro.SparkSpec
import repro.data.UciLike

/** Scratch harness for tuning the UCI analogues (ADAWAVE_TUNE=ds1,ds2). */
class TuneSpec extends SparkSpec {
  test("tune selected datasets") {
    val sel = sys.env.get("ADAWAVE_TUNE").map(_.split(",").toSet)
    assume(sel.isDefined, "set ADAWAVE_TUNE to run")
    val datasets = UciLike.all(roadmapN = 20000).filter(d => sel.get.contains(d.name))
    for (ds <- datasets) {
      val r = RealWorldHarness.evaluate(spark, ds)
      val paper = RealWorldHarness.PaperTable.get(ds.name)
      println(s"== ${ds.name} (${ds.n},${ds.d})")
      RealWorldHarness.Methods.zipWithIndex.foreach { case (m, i) =>
        val p = paper.map(v => f"${v(i)}%.3f").getOrElse("-")
        println(f"   $m%-10s ours=${r.scores(m)}%.3f paper=$p")
      }
    }
  }
}
