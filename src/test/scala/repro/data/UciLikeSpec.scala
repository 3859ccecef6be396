package repro.data

import org.scalatest.funsuite.AnyFunSuite

class UciLikeSpec extends AnyFunSuite {

  test("each analogue matches the paper's (n, d) header and class count") {
    val expect = Map(
      "Seeds"   -> (210, 7, 3),
      "Roadmap" -> (20000, 2, 8),
      "Iris"    -> (150, 4, 3),
      "Glass"   -> (214, 9, 6),
      "DUMDH"   -> (869, 13, 4),
      "HTRU2"   -> (17898, 8, 2),
      "Derm."   -> (366, 33, 6),
      "Motor"   -> (94, 3, 3),
      "Whol."   -> (440, 8, 2))
    for (ds <- UciLike.all()) {
      val (n, d, k) = expect(ds.name)
      assert(ds.n == n, s"${ds.name} n=${ds.n}")
      assert(ds.d == d, s"${ds.name} d=${ds.d}")
      assert(ds.k == k, s"${ds.name} k=${ds.k}")
    }
  }

  test("glass keeps the real dataset's strong class imbalance") {
    val y = UciLike.glass().y
    val sizes = (1 to 6).map(c => y.count(_ == c))
    assert(sizes.sum == 214)
    assert(sizes.max.toDouble / sizes.min >= 4.0, s"sizes $sizes")
  }

  test("HTRU2 keeps the ~9% positive-class imbalance") {
    val y = UciLike.htru2().y
    assert(y.count(_ == 2) == 1639)
  }

  test("labels are 1-based and every point has one (no noise label)") {
    for (ds <- UciLike.all(roadmapN = 2000))
      assert(ds.y.forall(_ >= 1), ds.name)
  }

  test("generators are deterministic") {
    val a = UciLike.seeds()
    val b = UciLike.seeds()
    assert(a.y.sameElements(b.y))
    assert(a.x.zip(b.x).forall { case (p, q) => p.sameElements(q) })
  }

  test("roadmap has dense city cores") {
    val ds = UciLike.roadmap(n = 5000)
    val cities = Seq((0.15, 0.80), (0.45, 0.85), (0.80, 0.75), (0.25, 0.45),
                     (0.60, 0.50), (0.85, 0.30), (0.40, 0.15), (0.10, 0.20))
    val near = ds.x.count(p => cities.exists { case (cx, cy) => math.hypot(p(0) - cx, p(1) - cy) < 0.12 })
    assert(near >= ds.n * 0.25, s"only $near near cities")
  }

  test("roadmap ground truth is the nearest city") {
    val ds = UciLike.roadmap(n = 1000)
    assert(ds.y.toSet.subsetOf((1 to 8).toSet))
  }

  test("unitScale maps every dimension onto [0, 1]") {
    val ds = UciLike.dumdh()
    val s = UciLike.unitScale(ds.x)
    for (j <- 0 until ds.d) {
      val col = s.map(_(j))
      assert(math.abs(col.min) < 1e-12 && math.abs(col.max - 1.0) < 1e-12)
    }
  }

  test("unitScale handles constant columns") {
    val s = UciLike.unitScale(Array(Array(1.0, 5.0), Array(2.0, 5.0)))
    assert(s.forall(_(1) == 0.5))
  }

  test("wholesale is axis-aligned (separation concentrated in two dims)") {
    val ds = UciLike.wholesale()
    val byClass = ds.y.distinct.sorted.map(c => ds.x.zip(ds.y).filter(_._2 == c).map(_._1))
    val meanDiff = (j: Int) => math.abs(
      byClass(0).map(_(j)).sum / byClass(0).length - byClass(1).map(_(j)).sum / byClass(1).length)
    assert(meanDiff(0) > 1.0)
    assert((2 until 8).forall(j => meanDiff(j) < 0.5))
  }

  test("motor is easy: very separated class means") {
    val ds = UciLike.motor()
    val byClass = (1 to 3).map(c => ds.x.zip(ds.y).filter(_._2 == c).map(_._1))
    for (a <- 0 until 3; b <- (a + 1) until 3) {
      val d = math.sqrt((0 until 3).map { j =>
        val ma = byClass(a).map(_(j)).sum / byClass(a).length
        val mb = byClass(b).map(_(j)).sum / byClass(b).length
        (ma - mb) * (ma - mb)
      }.sum)
      assert(d > 4.0, s"classes $a,$b only $d apart")
    }
  }
}
