package repro.delaunay

import org.scalatest.funsuite.AnyFunSuite

import repro.TestUtil
import repro.geometry.PointSet

class DelaunaySpec extends AnyFunSuite {

  test("triangulation of a square contains the hull edges") {
    val ps = PointSet.fromRows(Seq(
      Array(0.0, 0.0), Array(1.0, 0.0), Array(1.0, 1.0), Array(0.0, 1.0)))
    val t = Delaunay.triangulate(ps)
    val e = t.edges.toSet
    assert(e.contains((0, 1)) && e.contains((1, 2)) && e.contains((2, 3)) && e.contains((0, 3)))
    // One of the two diagonals, never both.
    assert(e.contains((0, 2)) ^ e.contains((1, 3)))
  }

  test("Delaunay empty-circumcircle property holds on random points") {
    val ps = TestUtil.randomPoints(60, 2, 1)
    val t = Delaunay.triangulate(ps)
    // For each Delaunay edge there must exist an empty circle through its
    // endpoints; verify via the dual statement on small inputs: every
    // non-edge pair that is closer than some edge... too weak. Instead
    // verify each edge belongs to some triangle pair with legal circles by
    // checking the Gabriel subset: every Gabriel edge must be Delaunay.
    def gabriel(i: Int, j: Int): Boolean = {
      val cx = (ps(i, 0) + ps(j, 0)) / 2
      val cy = (ps(i, 1) + ps(j, 1)) / 2
      val r2 = ps.dist2(i, j) / 4
      (0 until ps.n).forall { k =>
        k == i || k == j || {
          val dx = ps(k, 0) - cx; val dy = ps(k, 1) - cy
          dx * dx + dy * dy >= r2 - 1e-9
        }
      }
    }
    val edgeSet = t.edges.toSet
    for (i <- 0 until ps.n; j <- i + 1 until ps.n if gabriel(i, j)) {
      assert(edgeSet.contains((i, j)), s"Gabriel edge ($i,$j) missing from Delaunay")
    }
  }

  test("edge count is linear (at most 3n-6)") {
    val ps = TestUtil.randomPoints(300, 2, 2)
    val t = Delaunay.triangulate(ps)
    assert(t.edges.size <= 3 * ps.n - 6)
    assert(t.edges.size >= ps.n - 1, "triangulation must connect all points")
  }

  test("duplicates are reported and excluded from the triangulation") {
    val ps = TestUtil.pointsWithDuplicates(50, 2, 3)
    val t = Delaunay.triangulate(ps)
    assert(t.duplicateOf.nonEmpty)
    t.duplicateOf.foreach { case (dup, rep) =>
      assert(ps.dist(dup, rep) == 0.0)
      assert(!t.edges.exists { case (u, v) => u == dup || v == dup })
    }
  }

  test("triangulation rejects non-2D input") {
    intercept[IllegalArgumentException] {
      Delaunay.triangulate(TestUtil.randomPoints(10, 3, 4))
    }
  }

  test("collinear points triangulate into a connected path-compatible edge set") {
    val ps = PointSet.fromRows((0 until 10).map(i => Array(i.toDouble, 0.0)))
    val t = Delaunay.triangulate(ps)
    // All consecutive pairs must be present (they are Gabriel edges).
    for (i <- 0 until 9) assert(t.edges.contains((i, i + 1)))
  }
}

class DualTreeBoruvkaSpec extends AnyFunSuite {
  import repro.baseline.DualTreeBoruvka

  test("dual-tree Boruvka matches dense Prim on random data, several dims") {
    for (dim <- Seq(2, 3, 5); seed <- Seq(1L, 2L)) {
      val ps = TestUtil.randomPoints(150, dim, seed)
      val got = DualTreeBoruvka.mst(ps)
      assert(got.size == ps.n - 1)
      TestUtil.assertSameWeight(got, TestUtil.bruteEmst(ps))
    }
  }

  test("dual-tree Boruvka matches the exact edge set with unique weights") {
    val ps = TestUtil.randomPoints(120, 2, 3)
    assert(TestUtil.canonicalEdges(DualTreeBoruvka.mst(ps)) ==
      TestUtil.canonicalEdges(TestUtil.bruteEmst(ps)))
  }

  test("dual-tree Boruvka handles clustered and duplicated data") {
    val clustered = TestUtil.clusteredPoints(150, 3, 4)
    TestUtil.assertSameWeight(DualTreeBoruvka.mst(clustered), TestUtil.bruteEmst(clustered))
    val dups = TestUtil.pointsWithDuplicates(100, 2, 5)
    TestUtil.assertSameWeight(DualTreeBoruvka.mst(dups), TestUtil.bruteEmst(dups))
  }

  test("dual-tree Boruvka works at tiny sizes") {
    for (n <- Seq(2, 3, 9)) {
      val ps = TestUtil.randomPoints(n, 2, 6)
      assert(DualTreeBoruvka.mst(ps).size == n - 1)
    }
  }

  test("dual-tree Boruvka agrees with EMST-MemoGFK on varden data") {
    val ps = repro.geometry.Generators.ssVarden(400, 2, 7)
    TestUtil.assertSameWeight(
      DualTreeBoruvka.mst(ps),
      repro.core.EmstMemoGfk.mst(ps, repro.par.SeqScheme).edges)
  }
}
