package repro.bench

import repro.SparkSpec

/** Figure 11 analog: additional space of the layered graph and the
  * amortization of offline preprocessing over incremental rounds.
  */
class T7OverheadBench extends SparkSpec {
  test("Figure 11: space and offline-cost amortization") {
    val out = Tables.overhead(spark, Harness.benchScale)
    println(out)
    assert(out.contains("Extra space"))
  }
}
