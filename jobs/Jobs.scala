package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness._

/** Shared SparkSession builder for the spark-submit entrypoints. */
object JobSession {
  def get(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Regenerates Table I (AMI on the nine real-world-analogue datasets).
  * Usage: spark-submit --class repro.jobs.RealWorldJob repro.jar [roadmapN]
  */
object RealWorldJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("adawave-table1")
    val roadmapN = args.headOption.map(_.toInt).getOrElse(20000)
    println(RealWorldHarness.render(RealWorldHarness.run(spark, roadmapN)))
    spark.stop()
  }
}

/** Regenerates Table II (Glass attribute/class correlations). */
object GlassCorrJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("adawave-table2")
    println(GlassCorrHarness.render(GlassCorrHarness.correlations(spark)))
    spark.stop()
  }
}

/** Regenerates Fig. 8 as a table (AMI vs noise percentage).
  * Usage: ... NoiseSweepJob [clusterSize]  (paper uses 5600; default 1400)
  */
object NoiseSweepJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("adawave-fig8")
    val clusterSize = args.headOption.map(_.toInt).getOrElse(1400)
    println(NoiseSweepHarness.render(NoiseSweepHarness.run(spark, clusterSize)))
    spark.stop()
  }
}

/** Regenerates Fig. 10 as a table (runtime vs n at 75 % noise). */
object RuntimeJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("adawave-fig10")
    println(RuntimeHarness.render(RuntimeHarness.run(spark)))
    spark.stop()
  }
}

/** Runs AdaWave alone on the running example and prints a summary —
  * the Fig. 1/2 sanity demo.
  */
object AdaWaveDemo {
  def main(args: Array[String]): Unit = {
    import repro.core._
    import repro.data.ClusterData
    import repro.eval.AMI
    val spark = JobSession.get("adawave-demo")
    val noise = args.headOption.map(_.toDouble).getOrElse(0.8)
    val (x, truth) = ClusterData.runningExample(clusterSize = 1400, noiseFrac = noise)
    val pred = Harness.adaWave(spark, x, AdaWaveConfig.auto(2))
    val ami = AMI.amiNonNoise(truth, pred, ClusterData.NoiseLabel)
    val k = pred.distinct.count(_ != 0)
    println(f"AdaWave on running example (noise=${noise * 100}%.0f%%): clusters=$k ami=$ami%.3f")
    spark.stop()
  }
}
