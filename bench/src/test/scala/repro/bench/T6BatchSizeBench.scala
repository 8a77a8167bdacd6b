package repro.bench

import repro.SparkSpec

/** Figure 10 analog: Layph's speedup over the competitors as the update
  * batch grows from 10 to 10,000.
  */
class T6BatchSizeBench extends SparkSpec {
  test("Figure 10: varying amount of updates") {
    val out = Tables.batchSize(spark, Harness.benchScale)
    println(out)
    assert(out.contains("|ΔG|"))
  }
}
