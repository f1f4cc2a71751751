package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Top-K SSS (Appendix E): the heap-based search must equal sorting all
  * per-trajectory optima.
  */
class TopKSpec extends AnyFunSuite {

  private def db(seed: Int, n: Int): Seq[(Long, IndexedSeq[Point])] = {
    val r = new Random(seed)
    (0 until n).map(i => (i.toLong, TestGen.randPoints(r, 4 + r.nextInt(12))))
  }

  for (k <- Seq(1, 3, 5); seed <- 0 until 5)
    test(s"topK == sorted per-trajectory optima [k=$k seed=$seed]") {
      val data = db(seed, 12)
      val q = TestGen.randPoints(new Random(seed + 50), 5)
      val fn = Dist.dtw
      val got = TopK.cma(q, data, k, fn)
      val want = data.map { case (id, d) =>
        val r = CMA.search(q, d, fn); (id, r.dist)
      }.sortBy { case (id, dist) => (dist, id) }.take(k)
      assert(got.length == math.min(k, data.size))
      for ((h, (wid, wdist)) <- got.zip(want)) {
        TestGen.assertSameDist(h.dist, wdist)
        assert(h.trajId == wid || math.abs(h.dist - wdist) < 1e-12)
      }
    }

  test("topK with k larger than the database returns everything, sorted") {
    val data = db(3, 4)
    val got = TopK.cma(TestGen.randPoints(new Random(9), 4), data, 10, Dist.dtw)
    assert(got.length == 4)
    assert(got.map(_.dist).toSeq == got.map(_.dist).toSeq.sorted)
  }

  test("topK hits carry achievable intervals") {
    val data = db(7, 8)
    val q = TestGen.randPoints(new Random(8), 5)
    for (h <- TopK.cma(q, data, 3, Dist.fd)) {
      val d = data.find(_._1 == h.trajId).get._2
      TestGen.assertSameDist(FullDist.dist(q, d.slice(h.start - 1, h.end), Dist.fd), h.dist)
    }
  }

  test("topK rejects k < 1") {
    intercept[IllegalArgumentException] {
      TopK.cma(TestGen.randPoints(new Random(1), 3), db(1, 3), 0, Dist.dtw)
    }
  }

  test("topK skips empty trajectories") {
    val data = Seq((0L, IndexedSeq.empty[Point]), (1L, TestGen.randPoints(new Random(2), 6)))
    val got = TopK.cma(TestGen.randPoints(new Random(3), 3), data, 5, Dist.dtw)
    assert(got.length == 1 && got.head.trajId == 1L)
  }
}
