package repro.bench

import repro.SparkSpec

/** Figure 7 analog: runtime breakdown of Layph's four incremental phases. */
class T3BreakdownBench extends SparkSpec {
  test("Figure 7: Layph phase breakdown") {
    val out = Tables.breakdown(spark, Harness.benchScale)
    println(out)
    assert(out.contains("UpperIter"))
  }
}
