package repro.kdtree

import repro.geometry.PointSet

/** Array-based spatial-median kd-tree (§2.3, §3.1.1).
  *
  * Nodes are stored in pre-order in flat arrays (children always have larger
  * indices than their parent), each node owning a contiguous range
  * `[lo, hi)` of the permutation array `perm` — so a node's points are a
  * contiguous slice, which keeps the BCCP inner loops tight and makes the
  * whole tree one broadcastable object.
  *
  * Splits follow the paper: the bounding box is cut at the midpoint of its
  * widest dimension ("spatial median"); if the box is degenerate (all points
  * identical) the range is split in half by count so construction always
  * terminates. The default leaf size is 1, as required for the WSPD to
  * consist of genuinely well-separated pairs.
  */
final class KdTree(
    val points: PointSet,
    val perm: Array[Int],
    val lo: Array[Int],
    val hi: Array[Int],
    val left: Array[Int],
    val right: Array[Int],
    val boxMin: Array[Double],
    val boxMax: Array[Double],
    val nNodes: Int,
) extends Serializable {

  val dim: Int = points.dim

  /** Root node id (always 0). */
  @inline def root: Int = 0

  @inline def isLeaf(a: Int): Boolean = left(a) < 0

  /** Number of points under node `a`. */
  @inline def size(a: Int): Int = hi(a) - lo(a)

  /** Center coordinate `k` of node `a`'s bounding box. */
  @inline def center(a: Int, k: Int): Double =
    0.5 * (boxMin(a * dim + k) + boxMax(a * dim + k))

  /** Radius of the bounding sphere circumscribing node `a`'s box. */
  def radius(a: Int): Double = {
    var s = 0.0
    var k = 0
    while (k < dim) {
      val w = boxMax(a * dim + k) - boxMin(a * dim + k)
      s += w * w
      k += 1
    }
    0.5 * math.sqrt(s)
  }

  /** Diameter of node `a`'s bounding sphere (the paper's A_diam). */
  @inline def diameter(a: Int): Double = 2.0 * radius(a)

  /** Distance between the bounding-sphere centers of `a` and `b`. */
  def centerDist(a: Int, b: Int): Double = {
    var s = 0.0
    var k = 0
    while (k < dim) {
      val d = center(a, k) - center(b, k)
      s += d * d
      k += 1
    }
    math.sqrt(s)
  }

  /** The paper's d(A,B): minimum distance between the bounding spheres of
    * `a` and `b`, clamped at 0. A lower bound on any cross distance.
    */
  def sphereDist(a: Int, b: Int): Double =
    math.max(0.0, centerDist(a, b) - radius(a) - radius(b))

  /** Upper bound on any distance between a point of `a` and a point of `b`
    * (the d_max(A,B) of Figure 3).
    */
  def sphereMaxDist(a: Int, b: Int): Double =
    centerDist(a, b) + radius(a) + radius(b)

  /** Squared distance from an arbitrary query point to node `a`'s box. */
  def boxDist2(a: Int, q: Array[Double]): Double = {
    var s = 0.0
    var k = 0
    while (k < dim) {
      val v = q(k)
      val lo = boxMin(a * dim + k)
      val hi = boxMax(a * dim + k)
      val d = if (v < lo) lo - v else if (v > hi) v - hi else 0.0
      s += d * d
      k += 1
    }
    s
  }

  /** Distances (including self, which is 0) from point `qi` to its `k`
    * nearest neighbors, in non-decreasing order. Standard branch-and-bound
    * descent; used for HDBSCAN* core distances (cd = last element).
    */
  def kNearestDistances(qi: Int, k: Int): Array[Double] = {
    val q = points.point(qi)
    // Bounded max-heap of the k best squared distances.
    val heap = new Array[Double](k)
    var heapSize = 0
    def heapTop: Double = heap(0)
    def heapPush(v: Double): Unit = {
      if (heapSize < k) {
        heap(heapSize) = v; heapSize += 1
        var c = heapSize - 1
        while (c > 0 && heap((c - 1) / 2) < heap(c)) {
          val p = (c - 1) / 2
          val t = heap(p); heap(p) = heap(c); heap(c) = t
          c = p
        }
      } else if (v < heap(0)) {
        heap(0) = v
        var p = 0
        var done = false
        while (!done) {
          val l = 2 * p + 1; val r = 2 * p + 2
          var m = p
          if (l < k && heap(l) > heap(m)) m = l
          if (r < k && heap(r) > heap(m)) m = r
          if (m == p) done = true
          else { val t = heap(m); heap(m) = heap(p); heap(p) = t; p = m }
        }
      }
    }
    def visit(a: Int): Unit = {
      if (isLeaf(a)) {
        var i = lo(a)
        while (i < hi(a)) {
          heapPush(points.dist2(perm(i), qi))
          i += 1
        }
      } else {
        val l = left(a); val r = right(a)
        val dl = boxDist2(l, q); val dr = boxDist2(r, q)
        val (first, second, dSecond) = if (dl <= dr) (l, r, dr) else (r, l, dl)
        visit(first)
        if (heapSize < k || dSecond < heapTop) visit(second)
      }
    }
    visit(root)
    require(heapSize == k, s"kNN: requested $k neighbors but only $heapSize points")
    val out = heap.take(k).map(math.sqrt).sorted
    out
  }

  /** Point ids under node `a` (copy; for tests and small-scale code). */
  def pointsUnder(a: Int): Array[Int] = perm.slice(lo(a), hi(a))
}

object KdTree {

  /** Builds a kd-tree over `ps`. `leafSize` defaults to 1 (required by the
    * WSPD); k-NN-only callers may use a larger leaf.
    */
  def build(ps: PointSet, leafSize: Int = 1): KdTree = {
    require(leafSize >= 1)
    val n = ps.n
    val dim = ps.dim
    val maxNodes = 2 * n // leafSize=1 gives exactly 2n-1 nodes
    val perm = Array.tabulate(n)(identity)
    val loA = new Array[Int](maxNodes)
    val hiA = new Array[Int](maxNodes)
    val leftA = new Array[Int](maxNodes)
    val rightA = new Array[Int](maxNodes)
    val bMin = new Array[Double](maxNodes * dim)
    val bMax = new Array[Double](maxNodes * dim)
    var nNodes = 0

    def newNode(lo: Int, hi: Int): Int = {
      val a = nNodes
      nNodes += 1
      loA(a) = lo; hiA(a) = hi; leftA(a) = -1; rightA(a) = -1
      var k = 0
      while (k < dim) {
        var mn = Double.PositiveInfinity
        var mx = Double.NegativeInfinity
        var i = lo
        while (i < hi) {
          val v = ps(perm(i), k)
          if (v < mn) mn = v
          if (v > mx) mx = v
          i += 1
        }
        bMin(a * dim + k) = mn
        bMax(a * dim + k) = mx
        k += 1
      }
      a
    }

    def buildRange(lo: Int, hi: Int): Int = {
      val a = newNode(lo, hi)
      if (hi - lo > leafSize) {
        // Widest dimension of the bounding box.
        var wd = 0
        var wBest = -1.0
        var k = 0
        while (k < dim) {
          val w = bMax(a * dim + k) - bMin(a * dim + k)
          if (w > wBest) { wBest = w; wd = k }
          k += 1
        }
        var mid = lo
        if (wBest > 0.0) {
          val splitVal = 0.5 * (bMin(a * dim + wd) + bMax(a * dim + wd))
          // In-place partition: coords < splitVal to the left.
          var i = lo
          var j = hi - 1
          while (i <= j) {
            if (ps(perm(i), wd) < splitVal) i += 1
            else {
              val t = perm(i); perm(i) = perm(j); perm(j) = t
              j -= 1
            }
          }
          mid = i
          // Guard: midpoint split always separates (min < splitVal <= max),
          // but floating rounding can collapse one side; fall back to count.
          if (mid == lo || mid == hi) mid = lo + (hi - lo) / 2
        } else {
          mid = lo + (hi - lo) / 2 // all points identical: split by count
        }
        val l = buildRange(lo, mid)
        val r = buildRange(mid, hi)
        leftA(a) = l
        rightA(a) = r
      }
      a
    }

    require(n > 0, "empty point set")
    buildRange(0, n)
    new KdTree(ps, perm, loA, hiA, leftA, rightA, bMin, bMax, nNodes)
  }

  /** Per-node min and max core distance (cd_min(A), cd_max(A) of Table 1),
    * computed bottom-up given per-point core distances. Valid because
    * children have larger indices than parents in the pre-order layout.
    */
  def coreDistStats(t: KdTree, cd: Array[Double]): (Array[Double], Array[Double]) = {
    val mn = new Array[Double](t.nNodes)
    val mx = new Array[Double](t.nNodes)
    var a = t.nNodes - 1
    while (a >= 0) {
      if (t.isLeaf(a)) {
        var lo = Double.PositiveInfinity
        var hi = Double.NegativeInfinity
        var i = t.lo(a)
        while (i < t.hi(a)) {
          val v = cd(t.perm(i))
          if (v < lo) lo = v
          if (v > hi) hi = v
          i += 1
        }
        mn(a) = lo; mx(a) = hi
      } else {
        mn(a) = math.min(mn(t.left(a)), mn(t.right(a)))
        mx(a) = math.max(mx(t.left(a)), mx(t.right(a)))
      }
      a -= 1
    }
    (mn, mx)
  }
}
