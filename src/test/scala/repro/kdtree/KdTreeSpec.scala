package repro.kdtree

import org.scalatest.funsuite.AnyFunSuite

import repro.TestUtil

class KdTreeSpec extends AnyFunSuite {

  private def checkInvariants(t: KdTree): Unit = {
    val n = t.points.n
    // Root covers everything; perm is a permutation.
    assert(t.lo(t.root) == 0 && t.hi(t.root) == n)
    assert(t.perm.sorted.sameElements(Array.tabulate(n)(identity)))
    for (a <- 0 until t.nNodes) {
      assert(t.lo(a) < t.hi(a), s"empty node $a")
      if (!t.isLeaf(a)) {
        val l = t.left(a); val r = t.right(a)
        // Children partition the parent's range contiguously.
        assert(t.lo(l) == t.lo(a) && t.hi(l) == t.lo(r) && t.hi(r) == t.hi(a))
        // Pre-order layout: children have larger ids.
        assert(l > a && r > a)
      }
      // Bounding box contains every point of the node.
      var i = t.lo(a)
      while (i < t.hi(a)) {
        val p = t.perm(i)
        for (k <- 0 until t.dim) {
          assert(t.points(p, k) >= t.boxMin(a * t.dim + k) - 1e-12)
          assert(t.points(p, k) <= t.boxMax(a * t.dim + k) + 1e-12)
        }
        i += 1
      }
    }
  }

  test("build invariants hold on random data, several dims") {
    for (d <- Seq(1, 2, 3, 5, 7); seed <- Seq(1L, 2L)) {
      checkInvariants(KdTree.build(TestUtil.randomPoints(200, d, seed)))
    }
  }

  test("build invariants hold on clustered and duplicated data") {
    checkInvariants(KdTree.build(TestUtil.clusteredPoints(300, 3, 5)))
    checkInvariants(KdTree.build(TestUtil.pointsWithDuplicates(200, 2, 6)))
  }

  test("leafSize=1 gives exactly 2n-1 nodes and singleton leaves") {
    val t = KdTree.build(TestUtil.randomPoints(257, 2, 7))
    assert(t.nNodes == 2 * 257 - 1)
    for (a <- 0 until t.nNodes if t.isLeaf(a)) assert(t.size(a) == 1)
  }

  test("build handles all-identical points") {
    val ps = repro.geometry.PointSet.fromRows(Seq.fill(16)(Array(3.0, 4.0)))
    val t = KdTree.build(ps)
    checkInvariants(t)
    assert(t.nNodes == 31)
    assert(t.radius(t.root) == 0.0)
  }

  test("larger leafSize is honored") {
    val t = KdTree.build(TestUtil.randomPoints(500, 3, 8), leafSize = 16)
    for (a <- 0 until t.nNodes if t.isLeaf(a)) assert(t.size(a) <= 16)
  }

  test("radius and diameter are consistent and bound pairwise distances") {
    val t = KdTree.build(TestUtil.randomPoints(100, 3, 9))
    for (a <- 0 until t.nNodes) {
      assert(t.diameter(a) == 2 * t.radius(a))
      val pts = t.pointsUnder(a)
      for (i <- pts; j <- pts)
        assert(t.points.dist(i, j) <= t.diameter(a) + 1e-9)
    }
  }

  test("sphereDist lower-bounds and sphereMaxDist upper-bounds cross distances") {
    val t = KdTree.build(TestUtil.randomPoints(120, 2, 10))
    val rnd = new java.util.Random(0)
    for (_ <- 0 until 200) {
      val a = rnd.nextInt(t.nNodes)
      val b = rnd.nextInt(t.nNodes)
      val lo = t.sphereDist(a, b)
      val hi = t.sphereMaxDist(a, b)
      for (i <- t.pointsUnder(a); j <- t.pointsUnder(b)) {
        val d = t.points.dist(i, j)
        assert(d >= lo - 1e-9, s"d=$d below sphereDist=$lo")
        assert(d <= hi + 1e-9, s"d=$d above sphereMaxDist=$hi")
      }
    }
  }

  test("boxDist2 is zero inside the box and positive outside") {
    val t = KdTree.build(TestUtil.randomPoints(50, 2, 11))
    val inside = Array(t.center(t.root, 0), t.center(t.root, 1))
    assert(t.boxDist2(t.root, inside) == 0.0)
    val outside = Array(t.boxMax(0) + 5.0, t.boxMax(1) + 5.0)
    assert(t.boxDist2(t.root, outside) > 0.0)
  }

  test("kNearestDistances matches brute force for various k") {
    for (d <- Seq(2, 3, 5); leafSize <- Seq(1, 8)) {
      val ps = TestUtil.randomPoints(150, d, seed = 20 + d)
      val t = KdTree.build(ps, leafSize)
      for (k <- Seq(1, 2, 10, 50); qi <- 0 until 30) {
        val got = t.kNearestDistances(qi, k)
        val want = (0 until ps.n).map(j => ps.dist(qi, j)).sorted.take(k)
        assert(got.length == k)
        got.zip(want).foreach { case (g, w) =>
          assert(math.abs(g - w) < 1e-9, s"k=$k qi=$qi got=$g want=$w")
        }
      }
    }
  }

  test("kNearestDistances on clustered/duplicated data matches brute force") {
    val ps = TestUtil.pointsWithDuplicates(120, 3, seed = 33)
    val t = KdTree.build(ps)
    for (qi <- 0 until ps.n by 7; k <- Seq(1, 5, 17)) {
      val got = t.kNearestDistances(qi, k)
      val want = (0 until ps.n).map(j => ps.dist(qi, j)).sorted.take(k)
      got.zip(want).foreach { case (g, w) => assert(math.abs(g - w) < 1e-9) }
    }
  }

  test("k=1 distance is always zero (self included)") {
    val ps = TestUtil.randomPoints(60, 2, 12)
    val t = KdTree.build(ps)
    (0 until ps.n).foreach(i => assert(t.kNearestDistances(i, 1).head == 0.0))
  }

  test("kNearestDistances rejects k larger than n") {
    val t = KdTree.build(TestUtil.randomPoints(10, 2, 13))
    intercept[IllegalArgumentException](t.kNearestDistances(0, 11))
  }

  test("coreDistStats computes per-node min/max core distance") {
    val ps = TestUtil.randomPoints(80, 2, 14)
    val t = KdTree.build(ps)
    val cd = TestUtil.bruteCoreDist(ps, minPts = 5)
    val (mn, mx) = KdTree.coreDistStats(t, cd)
    for (a <- 0 until t.nNodes) {
      val vals = t.pointsUnder(a).map(cd)
      assert(mn(a) == vals.min)
      assert(mx(a) == vals.max)
    }
  }
}
