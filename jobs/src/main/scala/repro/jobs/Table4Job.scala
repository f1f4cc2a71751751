package repro.jobs

/** Entrypoint reproducing Table 4 (complexity summary): empirically fits the
  * time-vs-n growth exponent of each algorithm, validating the claimed
  * O(mn) vs O(mn²) behaviour. Pure driver-side compute (single pairs).
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val rows = repro.eval.Harness.table4()
    println("=== Table 4: complexity claims, empirical growth exponents ===")
    println(repro.eval.Harness.formatTable4(rows))
  }
}
