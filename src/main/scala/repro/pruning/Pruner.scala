package repro.pruning

import repro.core._

/** Algorithm 3: the full pruned search pipeline over a database of data
  * trajectories — GBP gate, then KPF lower-bound gate against the best
  * subtrajectory found so far, then the search algorithm itself. Generic in
  * the search algorithm so the efficiency table can run every baseline
  * through the identical pipeline (as the paper does for Table 3).
  */
object Pruner {

  /** Knobs of Appendix B/C; defaults mirror the paper's chosen values
    * (`mu = 0.4`, `r = 0.05`) with `eps` expressed in km (the paper's
    * `0.8e-4` is in degrees ≈ 0.9 km).
    */
  final case class Params(eps: Double, mu: Double = 0.4, r: Double = 0.05,
                          useGBP: Boolean = true, useKPF: Boolean = true)

  final case class Stats(var examined: Int = 0, var gbpPruned: Int = 0,
                         var kpfPruned: Int = 0, var searched: Int = 0)

  /** Best hit over `data` for query `q` using `searchOne` on survivors.
    * Mirrors Algorithm 3 lines 6–15: the first unpruned trajectory seeds the
    * incumbent; afterwards KPF prunes against the incumbent's distance.
    */
  def search(q: Array[Point], data: Iterable[(Long, Array[Point])], fn: DistFn[Point],
             params: Params,
             searchOne: (Array[Point], Array[Point]) => SubtrajResult,
             stats: Stats = Stats()): Option[TopK.Hit] = {
    val qCells = GBP.queryCells(q, params.eps)
    val qIdx: IndexedSeq[Point] = scala.collection.immutable.ArraySeq.unsafeWrapArray(q)
    var best: TopK.Hit = null
    for ((id, d) <- data if d.nonEmpty) {
      stats.examined += 1
      if (params.useGBP && !GBP.passes(qCells, d, params.eps, params.mu)) {
        stats.gbpPruned += 1
      } else if (best != null && params.useKPF &&
                 KPF.estimate(qIdx, scala.collection.immutable.ArraySeq.unsafeWrapArray(d), fn, params.r) >= best.dist) {
        stats.kpfPruned += 1
      } else {
        stats.searched += 1
        val r = searchOne(q, d)
        if (best == null || r.dist < best.dist) best = TopK.Hit(id, r.start, r.end, r.dist)
      }
    }
    Option(best)
  }

  /** OSF-comparator variant of the pipeline (same shape, weaker bound). */
  def searchOSF(q: Array[Point], data: Iterable[(Long, Array[Point])], fn: DistFn[Point],
                r: Double, edrEps: Double,
                searchOne: (Array[Point], Array[Point]) => SubtrajResult,
                stats: Stats = Stats()): Option[TopK.Hit] = {
    var best: TopK.Hit = null
    for ((id, d) <- data if d.nonEmpty) {
      stats.examined += 1
      val box = OSF.bbox(d)
      if (best != null && OSF.lowerBound(q, box, fn, r, edrEps) >= best.dist) {
        stats.kpfPruned += 1
      } else {
        stats.searched += 1
        val res = searchOne(q, d)
        if (best == null || res.dist < best.dist) best = TopK.Hit(id, res.start, res.end, res.dist)
      }
    }
    Option(best)
  }
}
