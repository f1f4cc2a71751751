package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** Spring must be exact for DTW (its DP cells coincide with CMA's Eq. 8),
  * and its threshold-mode reporting must emit sound candidates.
  */
class SpringSpec extends AnyFunSuite {

  for (seed <- 0 until 25)
    test(s"Spring == CMA == brute force under DTW [seed=$seed]") {
      val (q, d) = TestGen.randPair(seed * 19 + 4)
      val sp = Spring.search(q, d, Dist.dtw)
      val cm = CMA.search(q, d, Dist.dtw)
      TestGen.assertSameDist(sp.dist, cm.dist)
      TestGen.assertSameDist(FullDist.dist(q, d.slice(sp.start - 1, sp.end), Dist.dtw), sp.dist)
      TestGen.assertSameDist(sp.dist, BruteForce.search(q, d, Dist.dtw).dist)
    }

  test("Spring works on 1-point query and 1-point data") {
    val r = Spring.search(IndexedSeq(Point(0, 0)), IndexedSeq(Point(3, 4)), Dist.dtw)
    TestGen.assertSameDist(r.dist, 5.0)
    assert(r.start == 1 && r.end == 1)
  }

  for (seed <- 0 until 8)
    test(s"Spring reports are achievable and within threshold [seed=$seed]") {
      val (q, d) = TestGen.randPair(seed * 23 + 6)
      val opt = CMA.search(q, d, Dist.dtw).dist
      val eps = opt * 1.5 + 0.5
      val (best, reports) = Spring.searchWithReports(q, d, Dist.dtw, eps)
      TestGen.assertSameDist(best.dist, opt)
      assert(reports.nonEmpty, "the optimum itself must be reported")
      for (rep <- reports) {
        assert(rep.dist <= eps + 1e-9)
        assert(rep.start >= 1 && rep.end <= d.length)
        // reported distance matches a real alignment of the interval
        TestGen.assertSameDist(FullDist.dist(q, d.slice(rep.start - 1, rep.end), Dist.dtw), rep.dist)
      }
      assert(reports.exists(r => math.abs(r.dist - opt) <= 1e-9))
    }

  test("Spring finds an exact subsegment embedded in noise") {
    val r = new scala.util.Random(1)
    val d = TestGen.randPoints(r, 20)
    val q = d.slice(7, 13)
    val res = Spring.search(q, d, Dist.dtw)
    assert(res.dist == 0.0)
    assert(res.start == 8 && res.end == 13)
  }
}
