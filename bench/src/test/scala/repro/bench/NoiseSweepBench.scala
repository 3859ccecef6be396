package repro.bench

import repro.SparkSpec
import repro.harness.NoiseSweepHarness

/** Regenerates Fig. 8 as a table: AMI vs noise percentage (20…90 %) on the
  * paper's five-cluster synthetic dataset. Cluster size defaults to 1 400
  * points (the paper uses 5 600; set ADAWAVE_BENCH_CLUSTER_SIZE=5600 for the
  * full-size sweep — the shape is identical, see EXPERIMENTS.md).
  */
class NoiseSweepBench extends SparkSpec {

  test("Fig. 8 — AMI vs noise percentage") {
    val clusterSize = sys.env.getOrElse("ADAWAVE_BENCH_CLUSTER_SIZE", "1400").toInt
    val rows = NoiseSweepHarness.run(spark, clusterSize)
    println(NoiseSweepHarness.render(rows))

    val by = rows.map(r => r.noisePct -> r.scores).toMap
    // Headline: AdaWave stays strong deep into the noise.
    for (pct <- Seq(20, 50, 80))
      assert(by(pct)("AdaWave") > 0.55, s"AdaWave at $pct%: ${by(pct)("AdaWave")}")
    // AdaWave beats every baseline at extreme noise (the paper's Fig. 8 gap).
    for (m <- NoiseSweepHarness.Methods if m != "AdaWave")
      assert(by(80)("AdaWave") > by(80)(m), s"at 80% noise AdaWave should beat $m: ${by(80)}")
    // DBSCAN collapses somewhere in the sweep (the paper's cliff) while
    // AdaWave never does.
    assert(rows.map(_.scores("DBSCAN")).min < 0.1)
    assert(rows.map(_.scores("AdaWave")).min > 0.4)
  }
}
