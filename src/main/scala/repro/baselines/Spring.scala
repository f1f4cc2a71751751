package repro.baselines

import repro.core.{DtwFn, SubtrajResult}

/** SPRING (Sakurai et al. [19]): streaming subsequence matching under DTW.
  *
  * The DP cells coincide with CMA's Eq. 8 (`D(t,x) = sub + min(left, up,
  * diag)` with a free start via `D(t,0)=0`), so SPRING is exact for DTW —
  * but, as the paper notes (§3.2, §6.2), SPRING additionally performs the
  * per-arrival *disjoint-match reporting* bookkeeping (scan of the whole
  * column against the current `dmin` plus candidate capture), which CMA does
  * not need. We implement that bookkeeping faithfully so the measured
  * overhead vs CMA is real work, not a stub.
  */
object Spring {

  /** Optimal subtrajectory of `d` for `q` under DTW. `reports` in the result
    * of [[searchWithReports]] lists the disjoint matches SPRING would emit
    * with threshold `eps` (the "additional computations").
    */
  def search[T](q: IndexedSeq[T], d: IndexedSeq[T], fn: DtwFn[T]): SubtrajResult =
    searchWithReports(q, d, fn, Double.PositiveInfinity)._1

  def searchWithReports[T](q: IndexedSeq[T], d: IndexedSeq[T], fn: DtwFn[T],
                           eps: Double): (SubtrajResult, List[SubtrajResult]) = {
    require(q.nonEmpty && d.nonEmpty, "Spring requires non-empty trajectories")
    val sub = fn.subFn
    val m = q.length; val n = d.length
    // col(x) = D(t, x); start(x) = matching start position for that cell.
    var col = new Array[Double](m + 1)
    var nxt = new Array[Double](m + 1)
    var st  = new Array[Int](m + 1)
    var stN = new Array[Int](m + 1)
    java.util.Arrays.fill(col, Double.PositiveInfinity)
    col(0) = 0.0

    var dmin = Double.PositiveInfinity
    var ts = 0; var te = 0
    var reports: List[SubtrajResult] = Nil
    var globalBest: SubtrajResult = null

    var t = 1
    while (t <= n) {
      nxt(0) = 0.0
      stN(0) = t // a match starting "here" if cell (t,1) roots at this arrival
      var x = 1
      while (x <= m) {
        val left = nxt(x - 1)   // D(t, x-1)
        val up   = col(x)       // D(t-1, x)
        val diag = col(x - 1)   // D(t-1, x-1)
        var best = left; var src = 0
        if (up < best) { best = up; src = 1 }
        if (diag < best) { best = diag; src = 2 }
        nxt(x) = best + sub(q(x - 1), d(t - 1))
        stN(x) = src match {
          case 0 => if (x == 1) t else stN(x - 1)
          case 1 => st(x)
          case _ => if (x == 1) t else st(x - 1)
        }
        x += 1
      }
      // --- SPRING report bookkeeping (the extra per-arrival O(m) scan) ---
      if (dmin.isFinite && dmin <= eps) {
        var allDone = true
        var y = 1
        while (y <= m && allDone) {
          if (nxt(y) < dmin && stN(y) <= te) allDone = false
          y += 1
        }
        if (allDone) {
          reports = SubtrajResult(ts, te, dmin) :: reports
          dmin = Double.PositiveInfinity
        }
      }
      if (nxt(m) <= eps && nxt(m) < dmin) { dmin = nxt(m); ts = stN(m); te = t }
      // Track the global optimum directly from the column (exact regardless of
      // the reporting resets above).
      if (globalBest == null || nxt(m) < globalBest.dist - 1e-12)
        globalBest = SubtrajResult(stN(m), t, nxt(m))

      val tmp = col; col = nxt; nxt = tmp
      val tms = st; st = stN; stN = tms
      t += 1
    }
    if (dmin.isFinite) reports = SubtrajResult(ts, te, dmin) :: reports
    (globalBest, reports.reverse)
  }
}
