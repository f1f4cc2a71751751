package repro.eval

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.baselines._
import repro.baselines.rl.RLS
import repro.core._
import repro.pruning.Pruner

/** Shared experiment harness for the paper's evaluation tables. Each
  * `tableN` method runs the experiment distributed over trajectories with
  * Spark and returns printable rows; `bench/` suites assert on them and
  * `jobs/` mains print them.
  */
object Harness {

  /** Algorithms of Tables 2/3, in paper order. Spring is DTW-only and GB is
    * FD-only (paper §3.2/§3.3).
    */
  val AllAlgos: Seq[String] = Seq("POS", "PSS", "RLS", "RLS-Skip", "CMA", "ExactS", "Spring", "GB")

  def applicable(algo: String, fn: DistFn[Point]): Boolean = algo match {
    case "Spring" => fn.isInstanceOf[DtwFn[_]]
    case "GB"     => fn.isInstanceOf[FrechetFn[_]]
    case _        => true
  }

  /** Per-(dataset, fn) trained RLS policies: (plain, skip). */
  def trainPolicies(spec: DatasetSpec, fns: Seq[DistFn[Point]],
                    nPairs: Int = 8): Map[String, (RLS.Policy, RLS.Policy)] = {
    val pairs = Workloads.trainingPairs(spec, nPairs)
    fns.map { fn =>
      fn.name -> (RLS.train(pairs, fn, skip = false, seed = spec.seed),
                  RLS.train(pairs, fn, skip = true,  seed = spec.seed + 1))
    }.toMap
  }

  /** Dispatch an algorithm name to a pairwise search function. */
  def searcher(algo: String, fn: DistFn[Point],
               policies: Map[String, (RLS.Policy, RLS.Policy)]):
      (IndexedSeq[Point], IndexedSeq[Point]) => SubtrajResult = algo match {
    case "CMA"      => (q, d) => CMA.search(q, d, fn)
    case "ExactS"   => (q, d) => ExactS.search(q, d, fn)
    case "Spring"   => (q, d) => Spring.search(q, d, fn.asInstanceOf[DtwFn[Point]])
    case "GB"       => (q, d) => GB.search(q, d, fn.asInstanceOf[FrechetFn[Point]])
    case "POS"      => (q, d) => SplitSearch.pos(q, d, fn)
    case "PSS"      => (q, d) => SplitSearch.pss(q, d, fn)
    case "RLS"      => (q, d) => RLS.search(q, d, fn, policies(fn.name)._1)
    case "RLS-Skip" => (q, d) => RLS.search(q, d, fn, policies(fn.name)._2)
    case other      => throw new IllegalArgumentException(s"unknown algorithm $other")
  }

  // ------------------------------------------------------------------
  // Table 2: effectiveness (AR / MR / RR)
  // ------------------------------------------------------------------

  final case class Table2Row(dataset: String, fn: String, algo: String,
                             ar: Double, mr: Double, rrPct: Double)

  final case class MetricRec(dataset: String, fn: String, algo: String,
                             ar: Double, rank: Double, rr: Double)

  /** AR/MR/RR of every applicable algorithm for each (dataset, fn), averaged
    * over all (query, data-trajectory) pairs. The all-subtrajectory distance
    * matrix (ExactS's intermediate result) is computed once per (pair, fn)
    * and shared by all algorithms' rank metrics.
    */
  def table2(spark: SparkSession, specs: Seq[DatasetSpec]): Seq[Table2Row] = {
    import spark.implicits._
    specs.flatMap { spec =>
      val fns      = Workloads.distFns(spec)
      val queries  = Workloads.queries(spec)
      val policies = trainPolicies(spec, fns)
      val bcQ      = spark.sparkContext.broadcast(queries)
      val bcP      = spark.sparkContext.broadcast(policies)
      val specName = spec.name
      val algos    = AllAlgos

      val recs = Workloads.data(spark, spec).mapPartitions { it =>
        val qs  = bcQ.value
        val pol = bcP.value
        it.filter(_.length > 0).flatMap { t =>
          val d: IndexedSeq[Point] = scala.collection.immutable.ArraySeq.unsafeWrapArray(t.points)
          qs.iterator.flatMap { qArr =>
            val q: IndexedSeq[Point] = scala.collection.immutable.ArraySeq.unsafeWrapArray(qArr)
            fns.iterator.flatMap { fn =>
              val all = ExactS.allDistances(q, d, fn)
              algos.iterator.filter(applicable(_, fn)).map { algo =>
                val found = searcher(algo, fn, pol)(q, d)
                val ev = Metrics.evaluate(found, all)
                MetricRec(specName, fn.name, algo, ev.ar, ev.rank, ev.rrPct)
              }
            }
          }
        }
      }.collect()

      for (fn <- fns; algo <- algos if applicable(algo, fn)) yield {
        val sel = recs.filter(r => r.fn == fn.name && r.algo == algo)
        val agg = Metrics.aggregate(sel.map(r => Metrics.PairEval(r.ar, r.rank, r.rr)).toSeq)
        Table2Row(specName, fn.name, algo, agg.ar, agg.mr, agg.rrPct)
      }
    }
  }

  def formatTable2(rows: Seq[Table2Row]): String = {
    val sb = new StringBuilder
    sb.append(f"${"Dataset"}%-9s ${"Fn"}%-7s ${"Algorithm"}%-9s ${"AR"}%10s ${"MR"}%10s ${"RR"}%8s\n")
    rows.foreach { r =>
      sb.append(f"${r.dataset}%-9s ${r.fn}%-7s ${r.algo}%-9s ${r.ar}%10.4f ${r.mr}%10.2f ${r.rrPct}%7.2f%%\n")
    }
    sb.toString
  }

  // ------------------------------------------------------------------
  // Table 3: efficiency (wall seconds per dataset × fn × algorithm)
  // ------------------------------------------------------------------

  final case class Table3Row(dataset: String, fn: String, algo: String,
                             seconds: Double, overtime: Boolean,
                             bestDist: Double)

  /** Per-cell time budget: if a driver-side projection from two sample
    * trajectories exceeds it, the cell reports "overtime" (the paper's
    * Beijing × ExactS entries).
    */
  val OvertimeBudgetSec = 10.0

  /** Wall time to answer all queries over the full (pruned) database with
    * each algorithm — Algorithm 3's GBP+KPF pipeline runs inside each
    * partition, exactly as in the paper's Table 3 setup.
    */
  def table3(spark: SparkSession, specs: Seq[DatasetSpec]): Seq[Table3Row] = {
    import spark.implicits._
    specs.flatMap { spec =>
      val fns      = Workloads.distFns(spec)
      val queries  = Workloads.queries(spec)
      val policies = trainPolicies(spec, fns)
      val data     = Workloads.data(spark, spec).cache()
      data.count() // materialize so generation cost is excluded from timings
      // mu = 0.1: keep a sizable survivor fraction, as in the paper's Table 3
      // where the search phase (not pruning) separates the algorithms.
      val params   = Pruner.Params(eps = spec.gen.stepKm * 8, mu = 0.1)
      val bcP      = spark.sparkContext.broadcast(policies)
      val sample   = Workloads.dataLocal(spec).take(2).map(_.points)

      val rows = for (fn <- fns; algo <- AllAlgos if applicable(algo, fn)) yield {
        // Projection guard (drives the paper's "overtime" entries).
        val sLocal = searcher(algo, fn, policies)
        val t0s = System.nanoTime()
        sample.foreach(d => sLocal(scala.collection.immutable.ArraySeq.unsafeWrapArray(queries.head), scala.collection.immutable.ArraySeq.unsafeWrapArray(d)))
        val perPair = (System.nanoTime() - t0s) / 1e9 / sample.length
        val parallelism = math.min(spark.sparkContext.defaultParallelism, spec.nData)
        val projected = perPair * spec.nData * queries.length / parallelism
        if (projected > OvertimeBudgetSec) {
          Table3Row(spec.name, fn.name, algo, projected, overtime = true, Double.NaN)
        } else {
          val t0 = System.nanoTime()
          var bestDist = Double.PositiveInfinity
          for (q <- queries) {
            val partBest = data.mapPartitions { it =>
              val s = searcher(algo, fn, bcP.value)
              val trajs = it.filter(_.length > 0).map(t => (t.id, t.points))
              Pruner.search(q, trajs.toSeq, fn, params,
                (a: Array[Point], b: Array[Point]) => s(scala.collection.immutable.ArraySeq.unsafeWrapArray(a), scala.collection.immutable.ArraySeq.unsafeWrapArray(b))).iterator
            }.collect()
            if (partBest.nonEmpty) {
              val d = partBest.map(_.dist).min
              if (d < bestDist) bestDist = d
            }
          }
          Table3Row(spec.name, fn.name, algo, (System.nanoTime() - t0) / 1e9,
                    overtime = false, bestDist)
        }
      }
      data.unpersist()
      rows
    }
  }

  def formatTable3(rows: Seq[Table3Row]): String = {
    val sb = new StringBuilder
    sb.append(f"${"Dataset"}%-9s ${"Fn"}%-7s ${"Algorithm"}%-9s ${"Time(s)"}%12s\n")
    rows.foreach { r =>
      val t = if (r.overtime) f"overtime(~${r.seconds}%.0f)" else f"${r.seconds}%.2f"
      sb.append(f"${r.dataset}%-9s ${r.fn}%-7s ${r.algo}%-9s $t%12s\n")
    }
    sb.toString
  }

  // ------------------------------------------------------------------
  // Table 4: complexity summary — empirical growth-exponent validation
  // ------------------------------------------------------------------

  final case class Table4Row(algo: String, fn: String, claimed: String,
                             exponent: Double, times: Seq[(Int, Double)])

  /** Empirically validate the complexity claims of Table 4: measure per-pair
    * time vs data length `n` (fixed `m`) and fit the log-log slope. O(mn)
    * algorithms should show slope ≈ 1, ExactS ≈ 2. The linear algorithms run
    * on 8× larger inputs than ExactS (same fit validity) so their per-pair
    * times rise above timer noise.
    */
  def table4(sizes: Seq[Int] = Seq(250, 500, 1000, 2000), m: Int = 40,
             reps: Int = 5): Seq[Table4Row] = {
    val spec = TrajGenSpec(lenMin = 1, lenMax = 1, width = 20, height = 20, stepKm = 0.1)
    def trajOf(n: Int, id: Long): IndexedSeq[Point] =
      scala.collection.immutable.ArraySeq.unsafeWrapArray(TrajGen.gen(id, spec.copy(lenMin = n, lenMax = n), 99).points)
    val qSmall = trajOf(m, 1000)     // ExactS: m·n²/2 cells is already slow
    val qBig   = trajOf(m * 5, 1001) // linear algos: lift m·n above timer noise

    val dtw = Dist.dtw; val fd = Dist.fd
    val cases: Seq[(String, String, String, Int, (IndexedSeq[Point], IndexedSeq[Point]) => SubtrajResult)] = Seq(
      ("CMA",    "DTW", "O(mn)",  8, (a, b) => CMA.search(a, b, dtw)),
      ("CMA",    "FD",  "O(mn)",  8, (a, b) => CMA.search(a, b, fd)),
      ("Spring", "DTW", "O(mn)",  8, (a, b) => Spring.search(a, b, dtw)),
      ("GB",     "FD",  "O(mn)",  8, (a, b) => GB.search(a, b, fd)),
      ("POS",    "DTW", "O(mn)",  8, (a, b) => SplitSearch.pos(a, b, dtw)),
      ("ExactS", "DTW", "O(mn^2)", 1, (a, b) => ExactS.search(a, b, dtw)),
    )

    cases.map { case (algo, fnName, claimed, scale, run) =>
      val q = if (scale == 1) qSmall else qBig
      val times = sizes.map(_ * scale).map { n =>
        val d = trajOf(n, 2000 + n)
        run(q, d); run(q, d) // warm-up (JIT)
        val samples = (0 until reps).map { _ =>
          val t0 = System.nanoTime(); run(q, d); (System.nanoTime() - t0) / 1e9
        }
        (n, samples.min) // best-of: standard microbenchmark noise floor
      }
      // least-squares slope of log t vs log n
      val lx = times.map(t => math.log(t._1.toDouble))
      val ly = times.map(t => math.log(t._2))
      val mx = lx.sum / lx.size; val my = ly.sum / ly.size
      val slope = lx.zip(ly).map { case (a, b) => (a - mx) * (b - my) }.sum /
                  lx.map(a => (a - mx) * (a - mx)).sum
      Table4Row(algo, fnName, claimed, slope, times)
    }
  }

  def formatTable4(rows: Seq[Table4Row]): String = {
    val sb = new StringBuilder
    sb.append(f"${"Algorithm"}%-9s ${"Fn"}%-5s ${"Claimed"}%-9s ${"Fitted n-exponent"}%18s   times(n->s)\n")
    rows.foreach { r =>
      val ts = r.times.map { case (n, t) => f"$n->${t}%.4f" }.mkString(" ")
      sb.append(f"${r.algo}%-9s ${r.fn}%-5s ${r.claimed}%-9s ${r.exponent}%18.2f   $ts\n")
    }
    sb.toString
  }
}
