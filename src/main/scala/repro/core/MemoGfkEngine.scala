package repro.core

import scala.collection.mutable.ArrayBuffer

import repro.mst.{Edge, Kruskal, UnionFind}
import repro.par.ParScheme
import repro.wspd.{Ctx, Metric, Sep, Wspd}

/** Statistics reported next to each MST run — `pairsMaterialized` is the
  * quantity behind the paper's memory-usage claims (MemoGFK materializes
  * only the per-round S_l1 pairs; Naive/GFK materialize the full WSPD).
  */
final case class MstStats(
    pairsMaterialized: Long,
    peakLivePairs: Long,
    bccpComputed: Long,
    rounds: Int,
)

final case class MstResult(edges: IndexedSeq[Edge], stats: MstStats)

/** The MemoGFK round loop (Algorithm 3), generic over the separation
  * criterion and the pair metric so it serves EMST (EuclidMetric +
  * GeometricSep), HDBSCAN*-GanTao (MutualReachMetric + GeometricSep) and
  * HDBSCAN*-MemoGFK (MutualReachMetric + MutualUnreachableSep).
  */
object MemoGfkEngine {

  def mst(ctx: Ctx, sep: Sep, metric: Metric, par: ParScheme): MstResult = {
    val n = ctx.tree.points.n
    val sharedCtx = par.share(ctx)
    try {
      val uf = new UnionFind(n)
      val out = new ArrayBuffer[Edge](n - 1)
      // Cross-round BCCP cache (the paper: "we cache the BCCP results of
      // pairs to avoid repeated computations"). Driver-owned; re-shared
      // each round so Spark tasks read the accumulated state.
      val cache = new java.util.HashMap[Long, Edge]
      var beta = 2L
      var rhoLo = 0.0
      var rounds = 0
      var pairsMaterialized = 0L
      var bccpComputed = 0L
      var peak = 0L
      while (out.size < n - 1) {
        rounds += 1
        val scomp = par.share(Wspd.nodeComponents(ctx.tree, uf.snapshot()))
        val scache = par.share(cache)
        try {
          val rhoHi = Wspd.getRho(sharedCtx, sep, metric, beta, scomp, par)
          val round = Wspd.getPairs(sharedCtx, sep, metric, rhoLo, rhoHi, scomp, scache, par)
          round.newCacheEntries.foreach { case (k, e) => cache.put(k, e) }
          pairsMaterialized += round.edges.size
          bccpComputed += round.edges.size + round.newCacheEntries.size
          peak = math.max(peak, round.edges.size.toLong)
          Kruskal.runBatch(round.edges, uf, out)
          beta *= 2
          rhoLo = rhoHi
          // Safety net: with rhoHi = +inf every remaining pair was
          // considered, so the forest must now span.
          if (rhoHi.isPosInfinity && out.size < n - 1)
            throw new IllegalStateException(
              s"MemoGFK failed to span: ${out.size} of ${n - 1} edges")
        } finally { scomp.release(); scache.release() }
      }
      MstResult(out.toIndexedSeq, MstStats(pairsMaterialized, peak, bccpComputed, rounds))
    } finally sharedCtx.release()
  }
}
