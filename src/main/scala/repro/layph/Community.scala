package repro.layph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Dense-subgraph candidate discovery.
  *
  * The paper discovers candidates with a community detection algorithm
  * (Louvain) and caps community sizes at a threshold K. Distributed
  * Louvain is notoriously sequential; we substitute synchronous *label
  * propagation* with a deterministic tie-break and the same size cap K —
  * it optimizes the same objective the paper actually relies on (many
  * internal edges, few boundary vertices) and runs as pure Catalyst
  * DataFrame operations. The substitution is recorded in DESIGN.md.
  */
object Community {

  /** @param edgesDF   (src: long, dst: long, w: double) edge list
    * @param rounds    synchronous LPA rounds
    * @param maxSize   community size cap K (oversized groups are hash-split)
    * @return          (vertex, community) assignment; every vertex of the
    *                  edge list appears exactly once
    */
  def detect(spark: SparkSession, edgesDF: DataFrame, rounds: Int = 6, maxSize: Int = 1500): DataFrame = {
    // Undirected view: community structure ignores edge direction.
    val und = edgesDF.select(col("src").as("a"), col("dst").as("b"))
      .union(edgesDF.select(col("dst").as("a"), col("src").as("b")))
      .where(col("a") =!= col("b"))
      .distinct()
      .cache()

    // localCheckpoint each round: iterative self-joins otherwise grow the
    // logical plan exponentially and Catalyst analysis dominates runtime
    var labels = und.select(col("a").as("v")).distinct()
      .withColumn("label", col("v"))
      .localCheckpoint()

    for (_ <- 1 to rounds) {
      // each vertex votes its label to its neighbors; vertices keep a self
      // vote so singleton oscillation dies out deterministically
      val votes = und.join(labels, und("a") === labels("v"))
        .select(col("b").as("v"), col("label"))
        .union(labels.select(col("v"), col("label")))
      val counted = votes.groupBy("v", "label").agg(count(lit(1)).as("n"))
      val w = Window.partitionBy("v").orderBy(col("n").desc, col("label").asc)
      val next = counted
        .withColumn("rk", row_number().over(w))
        .where(col("rk") === 1)
        .select(col("v"), col("label"))
        .localCheckpoint()
      labels.unpersist(blocking = false)
      labels = next
    }

    // size cap K: hash-split oversized communities into ceil(size/K) buckets
    val sizes = labels.groupBy("label").agg(count(lit(1)).as("sz"))
    val out = labels.join(sizes, "label")
      .withColumn("parts", ceil(col("sz") / lit(maxSize.toDouble)).cast("long"))
      .withColumn("comm",
        when(col("parts") <= 1, col("label") * 1000L)
          .otherwise(col("label") * 1000L + pmod(hash(col("v")).cast("long"), col("parts"))))
      .select(col("v"), col("comm"))
    val dense = out.select(col("comm")).distinct()
      .withColumn("cid", row_number().over(Window.orderBy(col("comm"))).cast("long") - 1)
    val res = out.join(dense, "comm").select(col("v"), col("cid").as("community"))
    val materialized = res.localCheckpoint()
    und.unpersist(blocking = false)
    labels.unpersist(blocking = false)
    materialized
  }

  /** Driver-side convenience: vertex -> community id map. */
  def detectMap(spark: SparkSession, edgesDF: DataFrame, rounds: Int = 6, maxSize: Int = 1500): Map[Long, Long] = {
    val df = detect(spark, edgesDF, rounds, maxSize)
    val m = df.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    df.unpersist(blocking = false)
    m
  }

  /** Louvain-flavored agglomeration: synchronous LPA fragments large sparse
    * communities; this pass greedily merges a fragment into its strongest
    * partner whenever their connecting edges outnumber half the fragment's
    * internal edges (and the size cap allows it). Deterministic.
    */
  def agglomerate(
      edges: Iterator[repro.core.RawEdge],
      cand0: Map[Long, Long],
      maxSize: Int,
      passes: Int = 4,
  ): Map[Long, Long] = {
    val edgeList = edges.toArray
    var cand = cand0
    var done = false
    var pass = 0
    while (!done && pass < passes) {
      pass += 1
      val intra = scala.collection.mutable.Map.empty[Long, Long]
      val pair = scala.collection.mutable.Map.empty[(Long, Long), Long]
      val szm = scala.collection.mutable.Map.empty[Long, Int]
      cand.valuesIterator.foreach(c => szm.update(c, szm.getOrElse(c, 0) + 1))
      edgeList.foreach { e =>
        (cand.get(e.src), cand.get(e.dst)) match {
          case (Some(a), Some(b)) if a == b => intra.update(a, intra.getOrElse(a, 0L) + 1)
          case (Some(a), Some(b)) =>
            val k = (math.min(a, b), math.max(a, b))
            pair.update(k, pair.getOrElse(k, 0L) + 1)
          case _ =>
        }
      }
      val best = scala.collection.mutable.Map.empty[Long, (Long, Long)]
      pair.foreach { case ((a, b), n) =>
        if (best.get(a).forall(p => p._2 < n || (p._2 == n && p._1 < b))) best(a) = (b, n)
        if (best.get(b).forall(p => p._2 < n || (p._2 == n && p._1 < a))) best(b) = (a, n)
      }
      val remap = scala.collection.mutable.Map.empty[Long, Long]
      def root(c: Long): Long = remap.get(c).map(root).getOrElse(c)
      szm.keys.toSeq.sorted.foreach { a =>
        best.get(a).foreach { case (b, n) =>
          val ra = root(a); val rb = root(b)
          if (ra != rb && n > intra.getOrElse(a, 0L) / 2 &&
              szm.getOrElse(ra, 0) + szm.getOrElse(rb, 0) <= maxSize) {
            szm(rb) = szm.getOrElse(ra, 0) + szm.getOrElse(rb, 0)
            szm.remove(ra)
            remap(ra) = rb
          }
        }
      }
      if (remap.isEmpty) done = true
      else cand = cand.map { case (v, c) => v -> root(c) }
    }
    cand
  }
}
