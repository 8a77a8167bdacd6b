package repro.bench

import repro.SparkSpec

/** Table I analog: the synthetic stand-in datasets. */
class T1DatasetsBench extends SparkSpec {
  test("Table I: dataset statistics") {
    val out = Tables.datasets(spark, Harness.benchScale)
    println(out)
    assert(out.contains("UK") && out.contains("WB"))
  }
}
