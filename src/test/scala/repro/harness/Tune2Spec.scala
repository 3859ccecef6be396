package repro.harness

import repro.SparkSpec
import repro.core._
import repro.data.{ClusterData, UciLike}
import repro.eval.AMI

/** Scratch: inspect AdaWave internals on a UCI analogue (ADAWAVE_TUNE2=name). */
class Tune2Spec extends SparkSpec {
  test("inspect adawave on dataset") {
    val name = sys.env.get("ADAWAVE_TUNE2")
    assume(name.isDefined)
    val ds = UciLike.all(roadmapN = 20000).find(_.name == name.get).get
    val x = UciLike.unitScale(ds.x)
    println(s"== ${ds.name}: d=${ds.d}")
    val df = ClusterData.toDFn(spark, x, ds.y)
    val cols = (0 until ds.d).map(i => s"f$i")
    val q = Grid.quantize(df, cols, 64)
    var cells = q.cells
    var shift = 0
    while ((64 >> shift) > 4 && AdaWave.coarsen(cells).size > ds.n / 3) { cells = AdaWave.coarsen(cells); shift += 1 }
    println(s"   auto bins=${64 >> shift} occupied=${cells.size} densTop=${cells.values.toSeq.sortBy(-_).take(10)}")
    val t = Wavelet.transform(cells, ds.d, Wavelet.Haar, 1)
    val pos = t.filter(_._2 > 0)
    val s = pos.values.toSeq.sorted.reverse
    println(s"   transformed=${t.size} top=${s.take(10).map(v => f"$v%.3f").mkString(",")}")
    val thr = Elbow.threshold(pos.values)
    val kept = pos.collect { case (c, v) if v >= thr => c }.toSet
    println(s"   thr=$thr kept=${kept.size}")
    val labels = ConnectedComponents.label(kept, diagonal = false)
    val compSizes = labels.values.groupBy(identity).view.mapValues(_.size).values.toSeq.sortBy(-_)
    println(s"   components=${compSizes.size} sizes=${compSizes.take(10)}")
    val res = AdaWave.clusterAuto(df, cols, assignNoise = true)
    val pred = Harness.adaWaveAuto(spark, x, assignNoise = true)
    println(s"   numClusters=${res.numClusters} ami=${AMI.ami(ds.y, pred)}")
    val sizes = pred.groupBy(identity).view.mapValues(_.length).toSeq.sortBy(-_._2).take(8)
    println(s"   predSizes=$sizes")
  }
}
