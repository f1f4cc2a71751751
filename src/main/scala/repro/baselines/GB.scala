package repro.baselines

import repro.core.{FrechetFn, SubtrajResult}

import scala.collection.mutable

/** Greedy Backtracking (Gudmundsson et al. [8]): exact `O(mn)`-search-space
  * nearest-subtrajectory query under the discrete Fréchet distance.
  *
  * The matrix `X(i,j) = d(τq[i], τd[j])` induces a grid graph; a monotone
  * path from row 1 (any column) to row m (any column) costs the maximum
  * cell it traverses, and the optimal subtrajectory is the minimum-bottleneck
  * path. We implement it as the paper describes GB: a best-first search with
  * memoization ("breadth-first search with memorizing techniques") — nodes
  * can be pushed multiple times before settling, which is exactly the
  * re-search overhead the paper observes makes GB slower than CMA.
  */
object GB {

  def search[T](q: IndexedSeq[T], d: IndexedSeq[T], fn: FrechetFn[T]): SubtrajResult = {
    require(q.nonEmpty && d.nonEmpty, "GB requires non-empty trajectories")
    val sub = fn.subFn
    val m = q.length; val n = d.length

    // Entry = (bottleneck cost so far, row, col, start col). Min-heap on cost.
    final case class Entry(cost: Double, x: Int, j: Int, start: Int)
    implicit val ord: Ordering[Entry] = Ordering.by[Entry, Double](_.cost).reverse
    val pq = new mutable.PriorityQueue[Entry]()
    val settled = Array.ofDim[Boolean](m + 1, n + 1)

    var j = 1
    while (j <= n) { pq.enqueue(Entry(sub(q(0), d(j - 1)), 1, j, j)); j += 1 }

    while (pq.nonEmpty) {
      val e = pq.dequeue()
      if (!settled(e.x)(e.j)) {
        settled(e.x)(e.j) = true
        if (e.x == m) return SubtrajResult(e.start, e.j, e.cost)
        // moves: down (x+1, j), right (x, j+1), diagonal (x+1, j+1)
        val down = e.x + 1
        if (!settled(down)(e.j))
          pq.enqueue(Entry(math.max(e.cost, sub(q(down - 1), d(e.j - 1))), down, e.j, e.start))
        if (e.j < n) {
          val right = e.j + 1
          if (!settled(e.x)(right))
            pq.enqueue(Entry(math.max(e.cost, sub(q(e.x - 1), d(right - 1))), e.x, right, e.start))
          if (!settled(down)(right))
            pq.enqueue(Entry(math.max(e.cost, sub(q(down - 1), d(right - 1))), down, right, e.start))
        }
      }
    }
    throw new IllegalStateException("GB: no path found (unreachable)")
  }
}
