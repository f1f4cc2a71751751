package repro.core

/** Exhaustive `O(mn³)` search — the test-only ground truth the paper uses to
  * frame the problem (§1 "Challenges"): evaluate the full distance for every
  * one of the n(n+1)/2 subtrajectories.
  */
object BruteForce {

  /** Optimal subtrajectory by exhaustive enumeration (ties: smallest start,
    * then smallest end).
    */
  def search[T](q: IndexedSeq[T], d: IndexedSeq[T], fn: DistFn[T]): SubtrajResult = {
    val n = d.length
    var best: SubtrajResult = null
    var i = 1
    while (i <= n) {
      var j = i
      while (j <= n) {
        val dist = FullDist.dist(q, d.slice(i - 1, j), fn)
        if (best == null || dist < best.dist - 1e-12) best = SubtrajResult(i, j, dist)
        j += 1
      }
      i += 1
    }
    best
  }

  /** Full distance matrix `D(i)(j) = dist(q, d[i:j])` (1-based via offset 0),
    * `+inf` below the diagonal. `O(mn²)` using one incremental column per
    * start — the same trick ExactS uses, kept here as an independent copy so
    * ExactS can be validated against it.
    */
  def allDistances[T](q: IndexedSeq[T], d: IndexedSeq[T], fn: DistFn[T]): Array[Array[Double]] = {
    val n = d.length
    val D = Array.fill(n, n)(Double.PositiveInfinity)
    var i = 1
    while (i <= n) {
      val dp = PrefixDP(q, fn)
      var j = i
      while (j <= n) { D(i - 1)(j - 1) = dp.extend(d(j - 1)); j += 1 }
      i += 1
    }
    D
  }
}
