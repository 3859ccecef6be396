package repro.bench

import repro.SparkSpec
import repro.harness.RealWorldHarness

/** Regenerates Table I: AMI of the eight methods on the nine UCI-analogue
  * datasets. The printed table (and bench_output.txt) carries our numbers
  * next to the paper's; EXPERIMENTS.md records the comparison.
  */
class Table1RealWorldBench extends SparkSpec {

  test("Table I — real-world datasets") {
    val roadmapN = sys.env.getOrElse("ADAWAVE_ROADMAP_N", "20000").toInt
    val results = RealWorldHarness.run(spark, roadmapN)
    println(RealWorldHarness.render(results))

    // Shape assertions, not absolute-number assertions (synthetic analogues).
    val byName = results.map(r => r.name -> r.scores).toMap
    // AdaWave must be competitive overall: top-4 by mean AMI (the paper has
    // it first; our Gaussian-ish analogues keep centroid methods stronger
    // than the real UCI data does — see EXPERIMENTS.md).
    val meanBy = RealWorldHarness.Methods.map(m =>
      m -> results.map(_.scores(m)).sum / results.size).toMap
    val rank = meanBy.toSeq.sortBy(-_._2).map(_._1).indexOf("AdaWave")
    assert(rank < 4, s"AdaWave mean-AMI rank $rank, means=$meanBy")
    assert(meanBy("AdaWave") > 0.4, s"AdaWave mean ${meanBy("AdaWave")}")
    // The paper's headline cases: AdaWave strong on the noisy 2-D Roadmap,
    // well above DBSCAN there (same ordering as the paper's 0.735 vs 0.313).
    assert(byName("Roadmap")("AdaWave") > 0.5, byName("Roadmap").toString)
    assert(byName("Roadmap")("AdaWave") > byName("Roadmap")("DBSCAN"))
    // …and everyone weak on HTRU2 (imbalanced, overlapping).
    assert(RealWorldHarness.Methods.forall(m => byName("HTRU2")(m) < 0.6))
    // Motor is the easy case — AdaWave should ace it like the paper.
    assert(byName("Motor")("AdaWave") > 0.9, byName("Motor").toString)
  }
}
