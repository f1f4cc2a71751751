package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** Greedy Backtracking must be exact for the Fréchet distance. */
class GBSpec extends AnyFunSuite {

  for (seed <- 0 until 25)
    test(s"GB == CMA == brute force under FD [seed=$seed]") {
      val (q, d) = TestGen.randPair(seed * 41 + 9)
      val gb = GB.search(q, d, Dist.fd)
      val cm = CMA.search(q, d, Dist.fd)
      TestGen.assertSameDist(gb.dist, cm.dist)
      TestGen.assertSameDist(gb.dist, BruteForce.search(q, d, Dist.fd).dist)
      TestGen.assertSameDist(FullDist.dist(q, d.slice(gb.start - 1, gb.end), Dist.fd), gb.dist)
    }

  test("GB on single points") {
    val r = GB.search(IndexedSeq(Point(0, 0)), IndexedSeq(Point(3, 4)), Dist.fd)
    TestGen.assertSameDist(r.dist, 5.0)
    assert(r.start == 1 && r.end == 1)
  }

  test("GB finds the zero-cost embedded window") {
    val rnd = new scala.util.Random(8)
    val d = TestGen.randPoints(rnd, 18)
    val q = d.slice(5, 11)
    val res = GB.search(q, d, Dist.fd)
    assert(res.dist == 0.0)
    assert(res.start == 6 && res.end == 11)
  }

  test("GB bottleneck never exceeds the worst single substitution of any window") {
    val (q, d) = TestGen.randPair(300)
    val res = GB.search(q, d, Dist.fd)
    // trivial upper bound: align q with the best same-length window naively
    val bounds =
      for (s <- 0 to d.length - math.min(q.length, d.length)) yield {
        val w = d.slice(s, s + math.min(q.length, d.length))
        FullDist.dist(q, w, Dist.fd)
      }
    assert(res.dist <= bounds.min + 1e-9)
  }
}
