package repro.layph

import repro.{SparkSpec, SynthData}

class CommunitySpec extends SparkSpec {

  private def plantedGraph = SynthData.communityGraph(spark,
    nComm = 6, commSize = 30, intraDegree = 5.0, nBursts = 10, burstFan = 3, nSingles = 30, seed = 3)

  test("label propagation recovers planted communities with high purity") {
    val m = Community.detectMap(spark, plantedGraph, rounds = 6, maxSize = 200)
    val purity = (0 until 6).map { c =>
      val members = (0 until 30).map(j => (c * 30 + j).toLong).filter(m.contains)
      val top = members.groupBy(m).values.map(_.size).max
      top.toDouble / members.size
    }
    // a community occasionally splits in two under synchronous LPA — that is
    // harmless for layering (both halves can still be dense subgraphs)
    assert(purity.forall(_ >= 0.6), s"low purity: $purity")
    assert(purity.sum / purity.size >= 0.8, s"low average purity: $purity")
  }

  test("size cap splits oversized communities") {
    val m = Community.detectMap(spark, plantedGraph, rounds = 6, maxSize = 12)
    val sizes = m.groupBy(_._2).values.map(_.size)
    assert(sizes.max <= 24, s"community above cap tolerance: ${sizes.max}")
  }

  test("every vertex with an edge is assigned exactly one community") {
    val df = plantedGraph
    val m = Community.detectMap(spark, df, rounds = 4, maxSize = 200)
    val verts = df.select("src").union(df.select("dst")).distinct().count()
    assert(m.size == verts)
  }

  test("detection is deterministic") {
    val a = Community.detectMap(spark, plantedGraph, rounds = 4, maxSize = 200)
    val b = Community.detectMap(spark, plantedGraph, rounds = 4, maxSize = 200)
    assert(a == b)
  }

  test("community ids are dense from 0") {
    val m = Community.detectMap(spark, plantedGraph, rounds = 4, maxSize = 200)
    val ids = m.values.toSet
    assert(ids == (0L until ids.size).toSet)
  }
}
