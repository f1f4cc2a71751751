package repro.eval

import repro.core.SubtrajResult

/** The Table-2 effectiveness metrics (§6.1): Approximate Ratio, Mean Rank,
  * Relative Rank — all computed against the full all-subtrajectory distance
  * matrix of one (query, data-trajectory) pair.
  */
object Metrics {

  /** Per-pair evaluation: `ar` ratio to the optimum, `rank` of the found
    * distance among all n(n+1)/2 subtrajectories (1 = optimal), `rrPct`
    * percentage of subtrajectories strictly better than the found one.
    */
  final case class PairEval(ar: Double, rank: Double, rrPct: Double)

  private val Tol = 1e-9

  def evaluate(found: SubtrajResult, all: Array[Array[Double]]): PairEval = {
    val n = all.length
    var opt = Double.PositiveInfinity
    var better = 0L
    var total = 0L
    var i = 0
    while (i < n) {
      val row = all(i)
      var j = i
      while (j < n) {
        val d = row(j)
        if (d < opt) opt = d
        if (d < found.dist - Tol) better += 1
        total += 1
        j += 1
      }
      i += 1
    }
    val ar =
      if (opt <= Tol) { if (found.dist <= Tol) 1.0 else Double.NaN } // undefined: skip upstream
      else found.dist / opt
    PairEval(ar, (better + 1).toDouble, 100.0 * better / total)
  }

  /** Aggregated row: averages over pairs; NaN ARs (zero optima) skipped. */
  final case class Effect(ar: Double, mr: Double, rrPct: Double)

  def aggregate(evals: Seq[PairEval]): Effect = {
    require(evals.nonEmpty, "no pairs to aggregate")
    val ars = evals.map(_.ar).filterNot(_.isNaN)
    Effect(
      if (ars.isEmpty) 1.0 else ars.sum / ars.size,
      evals.map(_.rank).sum / evals.size,
      evals.map(_.rrPct).sum / evals.size)
  }
}
