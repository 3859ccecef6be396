package repro.core

import scala.collection.mutable

/** Step 4 of AdaWave (§IV-D): find connected components among the cells
  * that survived threshold filtering. Each component is a cluster.
  *
  * Adjacency is face adjacency (±1 along a single dimension, 2d
  * neighbours) by default; for low-dimensional data the full Moore
  * neighbourhood (3^d − 1 offsets, 8-connectivity in 2-D) can be used so
  * that diagonally-touching thin structures (rings) stay connected.
  */
object ConnectedComponents {

  /** Labels cells with component ids 1..k (0 is reserved for noise). */
  def label(cells: Set[Vector[Int]], diagonal: Boolean): Map[Vector[Int], Int] = {
    if (cells.isEmpty) return Map.empty
    val d = cells.head.size
    val offsets: Seq[Vector[Int]] =
      if (diagonal) mooreOffsets(d)
      else (0 until d).flatMap(i => Seq(Vector.fill(d)(0).updated(i, 1), Vector.fill(d)(0).updated(i, -1)))

    val labels = mutable.HashMap.empty[Vector[Int], Int]
    var next = 0
    for (seed <- cells) {
      if (!labels.contains(seed)) {
        next += 1
        val queue = mutable.ArrayDeque(seed)
        labels(seed) = next
        while (queue.nonEmpty) {
          val c = queue.removeHead()
          for (off <- offsets) {
            val nb = Vector.tabulate(d)(i => c(i) + off(i))
            if (cells.contains(nb) && !labels.contains(nb)) {
              labels(nb) = next
              queue.append(nb)
            }
          }
        }
      }
    }
    labels.toMap
  }

  /** All of {-1,0,1}^d except the origin. Only sensible for small d. */
  def mooreOffsets(d: Int): Seq[Vector[Int]] = {
    require(d <= 8, s"Moore neighbourhood explodes for d=$d; use face adjacency")
    def rec(i: Int): Seq[Vector[Int]] =
      if (i == 0) Seq(Vector.empty)
      else for (tail <- rec(i - 1); h <- Seq(-1, 0, 1)) yield h +: tail
    rec(d).filter(_.exists(_ != 0))
  }
}
