package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.TestUtil
import repro.geometry.Generators
import repro.mst.{Edge, Prim}
import repro.par.SeqScheme

class DendrogramSpec extends AnyFunSuite {

  private def checkStructure(d: Dendrogram, edges: IndexedSeq[Edge]): Unit = {
    val n = d.n
    // Every node reachable from the root exactly once; leaf set is 0..n-1.
    val seen = scala.collection.mutable.HashSet.empty[Int]
    def visit(node: Int): Unit = {
      assert(seen.add(node), s"node $node reached twice")
      if (!d.isLeaf(node)) {
        val i = node - n
        visit(d.left(i)); visit(d.right(i))
      }
    }
    visit(d.root)
    assert(seen.size == 2 * n - 1)
    // Parent weight dominates child weights (dendrogram heights decrease
    // downward: the split edge is the heaviest within its cluster).
    def maxW(node: Int): Double =
      if (d.isLeaf(node)) 0.0
      else {
        val i = node - n
        val l = maxW(d.left(i)); val r = maxW(d.right(i))
        assert(d.weight(i) >= l - 1e-12 && d.weight(i) >= r - 1e-12,
          s"node weight ${d.weight(i)} below child max ${math.max(l, r)}")
        d.weight(i)
      }
    maxW(d.root)
    // Node weights are exactly the input edge weights.
    assert(d.weight.sorted.toSeq == edges.map(_.w).sorted.toSeq)
  }

  test("sequential dendrogram: structural invariants on EMST input") {
    val ps = TestUtil.randomPoints(120, 2, 1)
    val mst = TestUtil.bruteEmst(ps)
    checkStructure(Dendrogram.buildSequential(ps.n, mst, s = 0), mst)
  }

  test("sequential dendrogram in-order equals Prim's traversal (ordered property)") {
    for (seed <- Seq(2L, 3L, 4L); s <- Seq(0, 5)) {
      val ps = TestUtil.randomPoints(100, 2, seed)
      val mst = TestUtil.bruteEmst(ps)
      val d = Dendrogram.buildSequential(ps.n, mst, s)
      val (order, bars) = d.reachabilityPlot()
      val (wantOrder, wantBars) = Prim.treeOrder(ps.n, mst, s)
      assert(order.sameElements(wantOrder), s"seed=$seed s=$s visit order differs")
      order.indices.foreach { i =>
        assert(bars(i) == wantBars(i) ||
          math.abs(bars(i) - wantBars(i)) < 1e-12, s"bar $i differs")
      }
    }
  }

  test("ordered dendrogram on the HDBSCAN* MST matches Prim (reachability plot)") {
    val ps = Generators.ssVarden(150, 2, 5)
    val mst = TestUtil.bruteMutualReachMst(ps, 10)
    val d = Dendrogram.buildSequential(ps.n, mst, s = 0)
    val (order, bars) = d.reachabilityPlot()
    val (wantOrder, wantBars) = Prim.treeOrder(ps.n, mst, 0)
    assert(order.sameElements(wantOrder))
    bars.zip(wantBars).foreach { case (a, b) =>
      assert(a == b || math.abs(a - b) < 1e-12)
    }
  }

  test("parallel dendrogram equals sequential node-for-node") {
    for (seed <- Seq(6L, 7L); cutoff <- Seq(4, 16, 64)) {
      val ps = TestUtil.randomPoints(200, 2, seed)
      val mst = TestUtil.bruteEmst(ps)
      val seq = Dendrogram.buildSequential(ps.n, mst, s = 0)
      val par = Dendrogram.buildParallel(ps.n, mst, s = 0, cutoff = cutoff)
      assert(par.root == seq.root, s"cutoff=$cutoff roots differ")
      assert(par.left.sameElements(seq.left), s"cutoff=$cutoff left arrays differ")
      assert(par.right.sameElements(seq.right), s"cutoff=$cutoff right arrays differ")
      assert(par.weight.sameElements(seq.weight))
    }
  }

  test("parallel dendrogram equals sequential on HDBSCAN* MSTs and varden data") {
    val ps = Generators.ssVarden(300, 3, 8)
    val mst = TestUtil.bruteMutualReachMst(ps, 10)
    val seq = Dendrogram.buildSequential(ps.n, mst, s = 3)
    val par = Dendrogram.buildParallel(ps.n, mst, s = 3, cutoff = 16)
    assert(par.root == seq.root)
    assert(par.left.sameElements(seq.left) && par.right.sameElements(seq.right))
  }

  test("parallel dendrogram with default cutoff on larger input") {
    val ps = Generators.uniformFill(3000, 2, 9)
    val mst = EmstMemoGfk.mst(ps, SeqScheme).edges
    val seq = Dendrogram.buildSequential(ps.n, mst, s = 0)
    val par = Dendrogram.buildParallel(ps.n, mst, s = 0)
    assert(par.root == seq.root)
    assert(par.left.sameElements(seq.left) && par.right.sameElements(seq.right))
  }

  test("dendrogram at n=2") {
    val edges = IndexedSeq(Edge(0, 1, 3.0))
    val d = Dendrogram.buildSequential(2, edges, s = 0)
    assert(d.root == 2)
    val (order, bars) = d.reachabilityPlot()
    assert(order.sameElements(Array(0, 1)))
    assert(bars(0).isPosInfinity && bars(1) == 3.0)
  }

  test("dendrogram handles a path graph with increasing weights (worst case)") {
    val n = 500
    val edges = IndexedSeq.tabulate(n - 1)(i => Edge(i, i + 1, (i + 1).toDouble))
    val seq = Dendrogram.buildSequential(n, edges, s = 0)
    val par = Dendrogram.buildParallel(n, edges, s = 0, cutoff = 8)
    assert(par.root == seq.root)
    assert(par.left.sameElements(seq.left) && par.right.sameElements(seq.right))
    val (order, _) = seq.reachabilityPlot()
    assert(order.sameElements(Array.tabulate(n)(identity)), "path must be visited in line order")
  }

  test("single-linkage labels from dendrogram cut match brute-force threshold components") {
    val ps = TestUtil.clusteredPoints(100, 2, 10)
    val mst = TestUtil.bruteEmst(ps)
    for (eps <- Seq(0.5, 2.0, 10.0)) {
      val got = Dendrogram.singleLinkageLabels(ps.n, mst, eps)
      // Brute force: components of the eps-threshold graph.
      val uf = new repro.mst.UnionFind(ps.n)
      for (i <- 0 until ps.n; j <- i + 1 until ps.n if ps.dist(i, j) <= eps) uf.union(i, j)
      val want = Array.tabulate(ps.n)(uf.find)
      assert(TestUtil.samePartition(got, want), s"eps=$eps")
    }
  }

  test("DBSCAN* labels from the HDBSCAN* MST match brute-force DBSCAN* at many eps") {
    val ps = TestUtil.clusteredPoints(120, 2, 11)
    val minPts = 5
    val res = Hdbscan.mst(ps, minPts, MemoGfk, SeqScheme)
    for (eps <- Seq(0.3, 1.0, 3.0, 20.0)) {
      val got = Dendrogram.dbscanStarLabels(ps.n, res.mst.edges, res.coreDist, eps)
      val want = TestUtil.bruteDbscanStar(ps, minPts, eps)
      assert(TestUtil.samePartition(got, want), s"eps=$eps")
    }
  }

  test("DBSCAN* extraction: eps below all core distances marks everything noise") {
    val ps = TestUtil.randomPoints(60, 2, 12)
    val res = Hdbscan.mst(ps, 10, MemoGfk, SeqScheme)
    val labels = Dendrogram.dbscanStarLabels(ps.n, res.mst.edges, res.coreDist, eps = 1e-12)
    assert(labels.forall(_ == -1))
  }

  test("DBSCAN* extraction: huge eps puts everything in one cluster") {
    val ps = TestUtil.randomPoints(60, 2, 13)
    val res = Hdbscan.mst(ps, 5, MemoGfk, SeqScheme)
    val labels = Dendrogram.dbscanStarLabels(ps.n, res.mst.edges, res.coreDist, eps = 1e9)
    assert(labels.forall(_ == 0))
  }

  test("vertexDistances computes BFS distances on the tree") {
    //    0 -1- 1 -1- 2
    //          |
    //          3
    val edges = IndexedSeq(Edge(0, 1, 1.0), Edge(1, 2, 1.0), Edge(1, 3, 1.0))
    val vd = Dendrogram.vertexDistances(4, edges, s = 0)
    assert(vd.toSeq == Seq(0, 1, 2, 2))
    val vd1 = Dendrogram.vertexDistances(4, edges, s = 1)
    assert(vd1.toSeq == Seq(1, 0, 1, 1))
  }

  test("vertexDistances rejects disconnected input") {
    intercept[IllegalArgumentException] {
      Dendrogram.vertexDistances(4, IndexedSeq(Edge(0, 1, 1.0)), 0)
    }
  }

  test("reachability plot bars are a permutation of the MST weights plus one infinity") {
    val ps = TestUtil.randomPoints(90, 3, 14)
    val mst = TestUtil.bruteEmst(ps)
    val d = Dendrogram.buildSequential(ps.n, mst, s = 0)
    val (_, bars) = d.reachabilityPlot()
    assert(bars.count(_.isPosInfinity) == 1)
    assert(bars.filterNot(_.isPosInfinity).sorted.toSeq == mst.map(_.w).sorted.toSeq)
  }

  test("a Figure-1-style example: cutting at eps=3.5 gives the paper's clusters") {
    // A toy MST of G_MR in the spirit of Figure 1 (ids a=0..i=8): cutting
    // the dendrogram at eps=3.5 must yield clusters {d,b} and {e,g,f,h}
    // with a, c, i as noise — the exact outcome the paper describes.
    val edges = IndexedSeq(
      Edge(0, 3, 4.0), Edge(3, 1, 3.0), Edge(1, 2, 5.7), Edge(3, 4, 5.1),
      Edge(4, 6, 2.2), Edge(6, 5, 2.2), Edge(5, 7, 2.8), Edge(7, 8, 5.1))
    val cd = Array(4.0, 3.0, 5.7, 3.0, 2.2, 2.2, 2.2, 2.8, 5.1)
    val labels = Dendrogram.dbscanStarLabels(9, edges, cd, eps = 3.5)
    assert(labels(0) == -1 && labels(2) == -1 && labels(8) == -1, "a, c, i are noise")
    assert(labels(3) >= 0 && labels(3) == labels(1), "{d,b} form one cluster")
    assert(labels(4) >= 0 && labels(4) == labels(5) && labels(5) == labels(6) && labels(6) == labels(7),
      "e,f,g,h form one cluster")
    assert(labels(3) != labels(4), "the two clusters are distinct")
    // The ordered dendrogram over these edges reproduces Prim's order.
    val d = Dendrogram.buildSequential(9, edges, s = 0)
    val (order, _) = d.reachabilityPlot()
    val (wantOrder, _) = Prim.treeOrder(9, edges, 0)
    assert(order.sameElements(wantOrder))
  }
}
