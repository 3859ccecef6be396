package repro.baselines

import scala.collection.mutable

/** DBSCAN (Ester et al. 1996). Noise is labeled 0, clusters 1..k.
  *
  * Neighbour queries use a bucket grid with cell side = eps, so a range
  * query only inspects the 3^d adjacent buckets — O(n · candidates) overall
  * instead of O(n²), which keeps the 100k-point runtime experiment honest.
  * Falls back to a full scan for d > 6 where the bucket fan-out explodes.
  */
object DBSCAN {

  val Noise = 0

  def fit(x: Array[Array[Double]], eps: Double, minPts: Int): Array[Int] = {
    val n = x.length
    if (n == 0) return Array.empty
    val d = x(0).length
    val index = if (d <= 6) Some(new BucketIndex(x, eps)) else None

    def neighbours(i: Int): Array[Int] = index match {
      case Some(idx) => idx.rangeQuery(i)
      case None =>
        val eps2 = eps * eps
        (0 until n).filter(j => LinAlg.sqDist(x(i), x(j)) <= eps2).toArray
    }

    val labels = Array.fill(n)(-1) // -1 = unvisited
    var cluster = 0
    var i = 0
    while (i < n) {
      if (labels(i) == -1) {
        val nb = neighbours(i)
        if (nb.length < minPts) labels(i) = Noise
        else {
          cluster += 1
          labels(i) = cluster
          val queue = mutable.ArrayDeque.from(nb)
          while (queue.nonEmpty) {
            val j = queue.removeHead()
            if (labels(j) == Noise) labels(j) = cluster // border point
            if (labels(j) == -1) {
              labels(j) = cluster
              val nbj = neighbours(j)
              if (nbj.length >= minPts) queue.appendAll(nbj)
            }
          }
        }
      }
      i += 1
    }
    labels
  }

  /** Grid index: bucket id = floor(coord / eps) per dimension. */
  private final class BucketIndex(x: Array[Array[Double]], eps: Double) {
    private val d = x(0).length
    private val eps2 = eps * eps
    private val buckets = mutable.HashMap.empty[Vector[Int], mutable.ArrayBuffer[Int]]
    for (i <- x.indices)
      buckets.getOrElseUpdate(key(x(i)), mutable.ArrayBuffer.empty) += i

    private def key(p: Array[Double]): Vector[Int] =
      Vector.tabulate(d)(j => math.floor(p(j) / eps).toInt)

    private val offsets: Seq[Vector[Int]] = {
      def rec(i: Int): Seq[Vector[Int]] =
        if (i == 0) Seq(Vector.empty) else for (t <- rec(i - 1); h <- Seq(-1, 0, 1)) yield h +: t
      rec(d)
    }

    def rangeQuery(i: Int): Array[Int] = {
      val p = x(i)
      val k = key(p)
      val out = mutable.ArrayBuffer.empty[Int]
      for (off <- offsets) {
        val nb = Vector.tabulate(d)(j => k(j) + off(j))
        buckets.get(nb).foreach { ids =>
          for (j <- ids) if (LinAlg.sqDist(p, x(j)) <= eps2) out += j
        }
      }
      out.toArray
    }
  }
}
