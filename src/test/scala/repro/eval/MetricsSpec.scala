package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** AR / MR / RR semantics (§6.1 Metrics). */
class MetricsSpec extends AnyFunSuite {

  private def matrixOf(vals: Map[(Int, Int), Double], n: Int): Array[Array[Double]] = {
    val m = Array.fill(n, n)(Double.PositiveInfinity)
    for (((i, j), v) <- vals) m(i - 1)(j - 1) = v
    m
  }

  test("the exact optimum scores AR=1, MR=1, RR=0") {
    val all = matrixOf(Map((1, 1) -> 5.0, (1, 2) -> 2.0, (2, 2) -> 8.0), 2)
    val ev = Metrics.evaluate(SubtrajResult(1, 2, 2.0), all)
    assert(ev.ar == 1.0 && ev.rank == 1.0 && ev.rrPct == 0.0)
  }

  test("a second-best result has rank 2 and the right AR") {
    val all = matrixOf(Map((1, 1) -> 5.0, (1, 2) -> 2.0, (2, 2) -> 8.0), 2)
    val ev = Metrics.evaluate(SubtrajResult(1, 1, 5.0), all)
    assert(ev.ar == 2.5)
    assert(ev.rank == 2.0)
    TestGen.assertSameDist(ev.rrPct, 100.0 / 3.0, 1e-9)
  }

  test("the worst result ranks last") {
    val all = matrixOf(Map((1, 1) -> 5.0, (1, 2) -> 2.0, (2, 2) -> 8.0), 2)
    val ev = Metrics.evaluate(SubtrajResult(2, 2, 8.0), all)
    assert(ev.rank == 3.0)
    TestGen.assertSameDist(ev.rrPct, 200.0 / 3.0, 1e-9)
  }

  test("ties do not count as strictly better") {
    val all = matrixOf(Map((1, 1) -> 2.0, (1, 2) -> 2.0, (2, 2) -> 2.0), 2)
    val ev = Metrics.evaluate(SubtrajResult(2, 2, 2.0), all)
    assert(ev.rank == 1.0 && ev.rrPct == 0.0 && ev.ar == 1.0)
  }

  test("zero optimum with zero found gives AR=1; nonzero found gives NaN (skipped)") {
    val all = matrixOf(Map((1, 1) -> 0.0, (1, 2) -> 3.0, (2, 2) -> 4.0), 2)
    assert(Metrics.evaluate(SubtrajResult(1, 1, 0.0), all).ar == 1.0)
    assert(Metrics.evaluate(SubtrajResult(1, 2, 3.0), all).ar.isNaN)
  }

  test("aggregate averages and skips NaN ARs") {
    val agg = Metrics.aggregate(Seq(
      Metrics.PairEval(1.0, 1.0, 0.0),
      Metrics.PairEval(3.0, 5.0, 10.0),
      Metrics.PairEval(Double.NaN, 2.0, 5.0)))
    assert(agg.ar == 2.0)
    TestGen.assertSameDist(agg.mr, 8.0 / 3.0, 1e-12)
    assert(agg.rrPct == 5.0)
  }

  test("metrics agree with a brute-force recount on random instances") {
    for (seed <- 0 until 8) {
      val (q, d) = TestGen.randPair(seed + 500, mMax = 5, nMax = 12)
      val fn = Dist.dtw
      val all = repro.baselines.ExactS.allDistances(q, d, fn)
      val found = repro.baselines.SplitSearch.pos(q, d, fn)
      val ev = Metrics.evaluate(found, all)
      val flat = for (i <- d.indices; j <- i until d.length) yield all(i)(j)
      val better = flat.count(_ < found.dist - 1e-9)
      assert(ev.rank == better + 1)
      TestGen.assertSameDist(ev.rrPct, 100.0 * better / flat.size, 1e-9)
    }
  }
}
