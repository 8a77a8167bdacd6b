package repro.bench

import repro.SparkSpec

/** Figure 8 analog: effect of vertex replication on upper-layer size and
  * incremental runtime.
  */
class T4ReplicationBench extends SparkSpec {
  test("Figure 8: vertex replication effect") {
    val out = Tables.replication(spark, Harness.benchScale)
    println(out)
    assert(out.contains("UpperE reduction"))
  }
}
