package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{ConnectedComponents => CC}

class ConnectedComponentsSpec extends AnyFunSuite {

  test("empty set gives no labels") {
    assert(CC.label(Set.empty, diagonal = false).isEmpty)
  }

  test("single cell forms one component labeled 1") {
    assert(CC.label(Set(Vector(3, 3)), diagonal = false) == Map(Vector(3, 3) -> 1))
  }

  test("two face-adjacent cells share a component") {
    val m = CC.label(Set(Vector(0, 0), Vector(0, 1)), diagonal = false)
    assert(m.values.toSet.size == 1)
  }

  test("diagonal cells: separate under face adjacency, joined under Moore") {
    val cells = Set(Vector(0, 0), Vector(1, 1))
    assert(CC.label(cells, diagonal = false).values.toSet.size == 2)
    assert(CC.label(cells, diagonal = true).values.toSet.size == 1)
  }

  test("two distant blobs form two components") {
    val blobA = (for (i <- 0 to 2; j <- 0 to 2) yield Vector(i, j)).toSet
    val blobB = (for (i <- 10 to 12; j <- 10 to 12) yield Vector(i, j)).toSet
    val m = CC.label(blobA ++ blobB, diagonal = true)
    assert(m.values.toSet.size == 2)
    assert(blobA.map(m).size == 1 && blobB.map(m).size == 1)
  }

  test("a ring of cells is a single component") {
    val ring = (for {
      i <- 0 to 8; j <- 0 to 8
      r = math.hypot(i - 4.0, j - 4.0)
      if r >= 2.8 && r <= 4.2
    } yield Vector(i, j)).toSet
    assert(CC.label(ring, diagonal = true).values.toSet.size == 1)
  }

  test("an L-shaped corridor is a single component") {
    val l = ((0 to 5).map(i => Vector(i, 0)) ++ (0 to 5).map(j => Vector(5, j))).toSet
    assert(CC.label(l, diagonal = false).values.toSet.size == 1)
  }

  test("labels are consecutive starting from 1") {
    val cells = Set(Vector(0, 0), Vector(5, 5), Vector(9, 9))
    val labels = CC.label(cells, diagonal = false).values.toSet
    assert(labels == Set(1, 2, 3))
  }

  test("labeling is deterministic") {
    val cells = (0 until 50).map(i => Vector(i * 3 % 17, i * 7 % 13)).toSet
    assert(CC.label(cells, diagonal = true) == CC.label(cells, diagonal = true))
  }

  test("3-D face adjacency connects along every axis") {
    val m = CC.label(Set(Vector(0, 0, 0), Vector(0, 0, 1), Vector(0, 1, 1)), diagonal = false)
    assert(m.values.toSet.size == 1)
  }

  test("mooreOffsets enumerates 3^d - 1 neighbours") {
    assert(CC.mooreOffsets(1).size == 2)
    assert(CC.mooreOffsets(2).size == 8)
    assert(CC.mooreOffsets(3).size == 26)
  }

  test("mooreOffsets refuses absurd dimensionality") {
    intercept[IllegalArgumentException] { CC.mooreOffsets(9) }
  }

  test("high-dimensional face adjacency works (d = 12)") {
    val a = Vector.fill(12)(0)
    val b = a.updated(7, 1)
    val c = Vector.fill(12)(5)
    val m = CC.label(Set(a, b, c), diagonal = false)
    assert(m(a) == m(b) && m(a) != m(c))
  }
}
