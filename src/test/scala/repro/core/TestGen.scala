package repro.core

import scala.util.Random

/** Shared generators for the randomized correctness suites: small random
  * trajectories plus the distance-function instances under test.
  */
object TestGen {

  def randPoints(r: Random, n: Int, scale: Double = 1.0): IndexedSeq[Point] =
    IndexedSeq.fill(n)(Point(r.nextDouble() * scale, r.nextDouble() * scale))

  /** A random-walk pair (q, d) where q resembles a perturbed subsegment of d
    * about half the time — exercises both "match exists" and "no match"
    * regimes.
    */
  def randPair(seed: Int, mMax: Int = 8, nMax: Int = 20): (IndexedSeq[Point], IndexedSeq[Point]) = {
    val r = new Random(seed)
    val n = 1 + r.nextInt(nMax)
    val d = randPoints(r, n)
    val m = 1 + r.nextInt(mMax)
    val q =
      if (r.nextBoolean() && n >= 2) {
        val len = math.min(m, n)
        val s = r.nextInt(n - len + 1)
        (0 until len).map(k => Point(d(s + k).x + r.nextGaussian() * 0.05,
                                     d(s + k).y + r.nextGaussian() * 0.05))
      } else randPoints(r, m)
    (q, d)
  }

  /** The point-space distance functions exercised by the property suites.
    * All satisfy the `del + ins >= sub` triangle-type condition CMA's Eq. 7
    * relies on (DESIGN.md §3).
    */
  val pointFns: Seq[DistFn[Point]] = Seq(
    Dist.dtw,
    Dist.fd,
    Dist.edr(0.3),
    Dist.erp(Point(0.5, 0.5)),
    Dist.wedCustom[Point]("WEDC",
      subF = (a, b) => math.min(a.distTo(b), 1.9),
      delF = _ => 1.2,
      insF = _ => 0.8),
  )

  /** Character-sequence functions (the paper's worked-example setting). */
  val charFns: Seq[DistFn[Char]] = Seq(Dist.wedUnit[Char])

  def assertSameDist(a: Double, b: Double, tol: Double = 1e-9): Unit =
    assert(math.abs(a - b) <= tol || (a.isInfinite && b.isInfinite),
      s"distance mismatch: $a vs $b")
}
