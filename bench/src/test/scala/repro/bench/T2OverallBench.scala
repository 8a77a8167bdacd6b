package repro.bench

import repro.SparkSpec

/** Figures 5 + 6 analog: overall incremental performance and edge
  * activations of Layph vs Restart / KickStarter / RisGraph / GraphBolt /
  * DZiG / Ingress on all four graphs and four workloads.
  */
class T2OverallBench extends SparkSpec {
  test("Figures 5+6: overall performance and edge activations") {
    val out = Tables.overall(spark, Harness.benchScale)
    println(out)
    assert(out.contains("Layph") && out.contains("Ingress"))
  }

  test("Figure 5e: vertex updates") {
    val out = Tables.vertexUpdates(spark, Harness.benchScale)
    println(out)
    assert(out.contains("PageRank"))
  }
}
