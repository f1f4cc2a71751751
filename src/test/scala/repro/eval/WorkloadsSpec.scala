package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core._

/** Workload generation: dataset specs, query derivation, training pairs. */
class WorkloadsSpec extends AnyFunSuite with SparkSpec {

  test("dataLocal is deterministic and matches the Spark Dataset") {
    val spec = Workloads.tiny
    val local = Workloads.dataLocal(spec)
    val dist = Workloads.data(spark, spec).collect().sortBy(_.id)
    assert(local.length == spec.nData && dist.length == spec.nData)
    for ((a, b) <- local.zip(dist)) {
      assert(a.id == b.id)
      assert(a.xs.toSeq == b.xs.toSeq && a.ys.toSeq == b.ys.toSeq)
    }
  }

  test("SynthData.trajectories matches TrajGen on the executors") {
    val spec = Workloads.tiny.gen
    val ds = repro.SynthData.trajectories(spark, 6, spec, seed = 5).collect().sortBy(_.id)
    for (t <- ds) {
      val want = TrajGen.gen(t.id, spec, 5)
      assert(t.xs.toSeq == want.xs.toSeq)
    }
  }

  test("queries have the configured lengths and are deterministic") {
    val spec = Workloads.tiny
    val q1 = Workloads.queries(spec)
    val q2 = Workloads.queries(spec)
    assert(q1.length == spec.nQueries)
    for ((a, b) <- q1.zip(q2)) assert(a.toSeq == b.toSeq)
    for (q <- q1) assert(q.length >= spec.qLenMin && q.length <= spec.qLenMax)
  }

  test("queries stay near the generator bounding box") {
    val spec = Workloads.tiny
    for (q <- Workloads.queries(spec); p <- q) {
      assert(p.x > -5 && p.x < spec.gen.width + 5)
      assert(p.y > -5 && p.y < spec.gen.height + 5)
    }
  }

  test("training pairs are disjoint from evaluation data and queries") {
    val spec = Workloads.tiny
    val pairs = Workloads.trainingPairs(spec, 3)
    assert(pairs.length == 3)
    val dataSet = Workloads.dataLocal(spec).map(_.xs.toSeq).toSet
    for ((q, d) <- pairs) {
      assert(q.nonEmpty && d.nonEmpty)
      assert(!dataSet.contains(d.map(_.x).toSeq))
    }
  }

  test("the three paper workloads have increasing trajectory lengths") {
    assert(Workloads.porto.gen.lenMax < Workloads.xian.gen.lenMin ||
           Workloads.porto.gen.lenMax < Workloads.xian.gen.lenMax)
    assert(Workloads.xian.gen.lenMax < Workloads.beijing.gen.lenMin)
  }

  test("distFns covers the four Table-2 functions") {
    val names = Workloads.distFns(Workloads.tiny).map(_.name)
    assert(names == Seq("DTW", "EDR", "ERP", "FD"))
  }
}
