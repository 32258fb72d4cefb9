package repro.wspd

import org.scalatest.funsuite.AnyFunSuite

import repro.TestUtil
import repro.kdtree.KdTree
import repro.mst.UnionFind
import repro.par.SeqScheme

class WspdSpec extends AnyFunSuite {

  private def euclidCtx(n: Int, dim: Int, seed: Long): Ctx =
    Ctx.euclidean(KdTree.build(TestUtil.randomPoints(n, dim, seed)))

  private def mutualCtx(n: Int, dim: Int, seed: Long, minPts: Int): Ctx = {
    val ps = TestUtil.randomPoints(n, dim, seed)
    Ctx.mutualReach(KdTree.build(ps), TestUtil.bruteCoreDist(ps, minPts))
  }

  /** Checks WSPD realization properties (§2.3): disjoint node pairs whose
    * interaction products exactly cover all unordered point pairs.
    */
  private def checkRealization(c: Ctx, pairs: IndexedSeq[(Int, Int)]): Unit = {
    val t = c.tree
    val n = t.points.n
    val counts = Array.ofDim[Int](n, n)
    pairs.foreach { case (a, b) =>
      val pa = t.pointsUnder(a)
      val pb = t.pointsUnder(b)
      assert(pa.toSet.intersect(pb.toSet).isEmpty, "pair sets must be disjoint")
      for (i <- pa; j <- pb) {
        val (x, y) = (math.min(i, j), math.max(i, j))
        counts(x)(y) += 1
      }
    }
    for (i <- 0 until n; j <- i + 1 until n) {
      assert(counts(i)(j) == 1, s"point pair ($i,$j) covered ${counts(i)(j)} times")
    }
  }

  test("geometric WSPD is a valid realization of P x P") {
    for ((dim, seed) <- Seq((2, 1L), (3, 2L), (5, 3L))) {
      val c = euclidCtx(80, dim, seed)
      checkRealization(c, Wspd.allPairs(SeqScheme.share(c), GeometricSep(2.0), SeqScheme))
    }
  }

  test("geometric WSPD pairs are actually well-separated (s=2)") {
    val c = euclidCtx(100, 2, 4)
    val sep = GeometricSep(2.0)
    val pairs = Wspd.allPairs(SeqScheme.share(c), sep, SeqScheme)
    pairs.foreach { case (a, b) =>
      assert(sep.wellSeparated(c, a, b))
      assert(c.tree.sphereDist(a, b) >=
        2.0 * math.max(c.tree.radius(a), c.tree.radius(b)) - 1e-12)
    }
  }

  test("WSPD size is linear in n for uniform low-dimensional data") {
    for (n <- Seq(100, 200, 400)) {
      val c = euclidCtx(n, 2, 5)
      val pairs = Wspd.allPairs(SeqScheme.share(c), GeometricSep(2.0), SeqScheme)
      assert(pairs.size < 60 * n, s"n=$n produced ${pairs.size} pairs")
    }
  }

  test("WSPD handles duplicate points") {
    val ps = TestUtil.pointsWithDuplicates(60, 2, 6)
    val c = Ctx.euclidean(KdTree.build(ps))
    checkRealization(c, Wspd.allPairs(SeqScheme.share(c), GeometricSep(2.0), SeqScheme))
  }

  test("higher separation constant produces at least as many pairs") {
    val c = euclidCtx(150, 2, 7)
    val s2 = Wspd.allPairs(SeqScheme.share(c), GeometricSep(2.0), SeqScheme).size
    val s4 = Wspd.allPairs(SeqScheme.share(c), GeometricSep(4.0), SeqScheme).size
    assert(s4 >= s2)
  }

  test("new HDBSCAN* well-separation yields a valid realization with fewer pairs") {
    for (minPts <- Seq(5, 10)) {
      val c = mutualCtx(100, 2, 8, minPts)
      val geo = Wspd.allPairs(SeqScheme.share(c), GeometricSep(2.0), SeqScheme)
      val mix = Wspd.allPairs(SeqScheme.share(c), MutualUnreachableSep, SeqScheme)
      checkRealization(c, mix)
      assert(mix.size <= geo.size,
        s"disjunction must terminate no later: ${mix.size} vs ${geo.size}")
    }
  }

  test("mutually-unreachable pairs satisfy the definition") {
    val c = mutualCtx(80, 3, 9, 10)
    val pairs = Wspd.allPairs(SeqScheme.share(c), MutualUnreachableSep, SeqScheme)
    val geom = GeometricSep(2.0)
    pairs.foreach { case (a, b) =>
      assert(geom.wellSeparated(c, a, b) ||
        MutualUnreachableSep.mutuallyUnreachable(c, a, b))
    }
  }

  test("nodeComponents marks pure subtrees with their component root") {
    val ps = TestUtil.randomPoints(64, 2, 10)
    val t = KdTree.build(ps)
    val uf = new UnionFind(ps.n)
    // Join a few clumps.
    (0 until 20).foreach(i => uf.union(i, (i + 1) % 20))
    val snap = uf.snapshot()
    val comp = Wspd.nodeComponents(t, snap)
    for (a <- 0 until t.nNodes) {
      val comps = t.pointsUnder(a).map(snap).distinct
      if (comps.length == 1) assert(comp(a) == comps.head)
      else assert(comp(a) == -1)
    }
  }

  test("getRho equals the brute-force minimum over large unconnected pairs") {
    val c = euclidCtx(90, 2, 11)
    val uf = new UnionFind(90)
    val scomp = SeqScheme.share(Wspd.nodeComponents(c.tree, uf.snapshot()))
    val sc = SeqScheme.share(c)
    val all = Wspd.allPairs(sc, GeometricSep(2.0), SeqScheme)
    for (beta <- Seq(2L, 8L, 64L)) {
      val brute = all
        .filter { case (a, b) => c.tree.size(a).toLong + c.tree.size(b) > beta }
        .map { case (a, b) => EuclidMetric.lb(c, a, b) }
      val want = if (brute.isEmpty) Double.PositiveInfinity else brute.min
      val got = Wspd.getRho(sc, GeometricSep(2.0), EuclidMetric, beta, scomp, SeqScheme)
      assert(math.abs(got - want) < 1e-12 || (got.isPosInfinity && want.isPosInfinity),
        s"beta=$beta got=$got want=$want")
    }
  }

  private def freshCache = SeqScheme.share(new java.util.HashMap[Long, repro.mst.Edge])

  test("getPairs over the full range returns one BCCP edge per WSPD pair") {
    val c = euclidCtx(70, 3, 12)
    val sc = SeqScheme.share(c)
    val uf = new UnionFind(70)
    val scomp = SeqScheme.share(Wspd.nodeComponents(c.tree, uf.snapshot()))
    val all = Wspd.allPairs(sc, GeometricSep(2.0), SeqScheme)
    val edges = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      0.0, Double.PositiveInfinity, scomp, freshCache, SeqScheme).edges
    assert(edges.size == all.size)
    val wantWeights = all.map { case (a, b) => EuclidMetric.bccp(c, a, b).w }.sorted
    assert(edges.map(_.w).sorted.zip(wantWeights).forall { case (a, b) => math.abs(a - b) < 1e-12 })
  }

  test("getPairs respects the [rhoLo, rhoHi) window") {
    val c = euclidCtx(70, 2, 13)
    val sc = SeqScheme.share(c)
    val uf = new UnionFind(70)
    val scomp = SeqScheme.share(Wspd.nodeComponents(c.tree, uf.snapshot()))
    val all = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      0.0, Double.PositiveInfinity, scomp, freshCache, SeqScheme).edges
    val ws = all.map(_.w).sorted
    val lo = ws(ws.length / 4)
    val hi = ws(3 * ws.length / 4)
    val window = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      lo, hi, scomp, freshCache, SeqScheme).edges
    assert(window.forall(e => e.w >= lo && e.w < hi))
    assert(window.size == ws.count(w => w >= lo && w < hi))
  }

  test("getPairs cache round-trip: warm cache gives identical results") {
    val c = euclidCtx(80, 3, 15)
    val sc = SeqScheme.share(c)
    val uf = new UnionFind(80)
    val scomp = SeqScheme.share(Wspd.nodeComponents(c.tree, uf.snapshot()))
    val cold = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      0.0, 1.0, scomp, freshCache, SeqScheme)
    // Feed the out-of-window entries back in, as the engine does.
    val warm = new java.util.HashMap[Long, repro.mst.Edge]
    cold.newCacheEntries.foreach { case (k, e) => warm.put(k, e) }
    val second = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      1.0, Double.PositiveInfinity, scomp, SeqScheme.share(warm), SeqScheme)
    // Warm-cache round must compute strictly fewer fresh BCCPs than a cold
    // run of the same window, and produce identical edges.
    val coldSecond = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      1.0, Double.PositiveInfinity, scomp, freshCache, SeqScheme)
    assert(second.edges.map(_.w).sorted.toSeq == coldSecond.edges.map(_.w).sorted.toSeq)
    assert(second.newCacheEntries.size <= coldSecond.newCacheEntries.size)
  }

  test("getPairs skips pairs already connected in the union-find") {
    val ps = TestUtil.randomPoints(40, 2, 14)
    val c = Ctx.euclidean(KdTree.build(ps))
    val sc = SeqScheme.share(c)
    val uf = new UnionFind(ps.n)
    (0 until ps.n - 1).foreach(i => uf.union(i, i + 1)) // everything connected
    val scomp = SeqScheme.share(Wspd.nodeComponents(c.tree, uf.snapshot()))
    val edges = Wspd.getPairs(sc, GeometricSep(2.0), EuclidMetric,
      0.0, Double.PositiveInfinity, scomp, freshCache, SeqScheme).edges
    assert(edges.isEmpty)
  }
}

class MetricSpec extends AnyFunSuite {

  test("EuclidMetric.bccp matches brute force over random node pairs") {
    val ps = TestUtil.randomPoints(100, 3, 1)
    val c = Ctx.euclidean(KdTree.build(ps))
    val rnd = new java.util.Random(1)
    for (_ <- 0 until 100) {
      val a = rnd.nextInt(c.tree.nNodes)
      val b = rnd.nextInt(c.tree.nNodes)
      val pa = c.tree.pointsUnder(a).toSet
      val pb = c.tree.pointsUnder(b).toSet
      if (pa.intersect(pb).isEmpty) {
        val got = EuclidMetric.bccp(c, a, b)
        val want = (for (i <- pa; j <- pb) yield ps.dist(i, j)).min
        assert(math.abs(got.w - want) < 1e-12)
        assert(pa.contains(got.u) && pb.contains(got.v))
        assert(math.abs(ps.dist(got.u, got.v) - got.w) < 1e-12)
      }
    }
  }

  test("MutualReachMetric.bccp matches brute force BCCP*") {
    val ps = TestUtil.randomPoints(90, 2, 2)
    val cd = TestUtil.bruteCoreDist(ps, 5)
    val c = Ctx.mutualReach(KdTree.build(ps), cd)
    def dm(i: Int, j: Int): Double = math.max(math.max(cd(i), cd(j)), ps.dist(i, j))
    val rnd = new java.util.Random(2)
    for (_ <- 0 until 100) {
      val a = rnd.nextInt(c.tree.nNodes)
      val b = rnd.nextInt(c.tree.nNodes)
      val pa = c.tree.pointsUnder(a).toSet
      val pb = c.tree.pointsUnder(b).toSet
      if (pa.intersect(pb).isEmpty) {
        val got = MutualReachMetric.bccp(c, a, b)
        val want = (for (i <- pa; j <- pb) yield dm(i, j)).min
        assert(math.abs(got.w - want) < 1e-12)
        assert(math.abs(dm(got.u, got.v) - got.w) < 1e-12)
      }
    }
  }

  test("metric lb/ub bracket the exact BCCP for both metrics") {
    val ps = TestUtil.randomPoints(80, 3, 3)
    val cd = TestUtil.bruteCoreDist(ps, 8)
    val ce = Ctx.euclidean(KdTree.build(ps))
    val cm = Ctx.mutualReach(KdTree.build(ps), cd)
    val rnd = new java.util.Random(3)
    for (_ <- 0 until 150) {
      for ((c, m) <- Seq((ce, EuclidMetric: Metric), (cm, MutualReachMetric: Metric))) {
        val a = rnd.nextInt(c.tree.nNodes)
        val b = rnd.nextInt(c.tree.nNodes)
        if (c.tree.pointsUnder(a).toSet.intersect(c.tree.pointsUnder(b).toSet).isEmpty) {
          val e = m.bccp(c, a, b)
          assert(m.lb(c, a, b) <= e.w + 1e-9)
          assert(m.ub(c, a, b) >= e.w - 1e-9)
        }
      }
    }
  }

  test("lb/ub bracket every cross-pair weight (the pruning invariant)") {
    // MemoGFK pruning relies on lb(A,B) lower-bounding and ub(A,B)
    // upper-bounding the weight of EVERY cross pair (hence of every
    // descendant pair's BCCP), not on the bounds being monotone.
    val ps = TestUtil.randomPoints(60, 2, 4)
    val cd = TestUtil.bruteCoreDist(ps, 5)
    val ce = Ctx.euclidean(KdTree.build(ps))
    val cm = Ctx.mutualReach(KdTree.build(ps), cd)
    def dm(i: Int, j: Int): Double = math.max(math.max(cd(i), cd(j)), ps.dist(i, j))
    val rnd = new java.util.Random(4)
    for (_ <- 0 until 150) {
      for ((c, m, wf) <- Seq(
          (ce, EuclidMetric: Metric, (i: Int, j: Int) => ps.dist(i, j)),
          (cm, MutualReachMetric: Metric, dm _))) {
        val a = rnd.nextInt(c.tree.nNodes)
        val b = rnd.nextInt(c.tree.nNodes)
        val pa = c.tree.pointsUnder(a)
        val pb = c.tree.pointsUnder(b)
        if (pa.toSet.intersect(pb.toSet).isEmpty) {
          val lo = m.lb(c, a, b)
          val hi = m.ub(c, a, b)
          for (i <- pa; j <- pb) {
            val w = wf(i, j)
            assert(w >= lo - 1e-9 && w <= hi + 1e-9, s"weight $w outside [$lo,$hi]")
          }
        }
      }
    }
  }
}
