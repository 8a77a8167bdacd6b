package repro.bench

import scala.util.Random
import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.core.{EdgeUpdate, GraphDelta, GraphState}

/** A synthetic stand-in for one of the paper's datasets (Table I), scaled
  * to laptop size while keeping its qualitative shape: the web graphs
  * (UK/IT/SK) have many small strong communities; the social graph (WB)
  * has few, very large, weakly separated communities — which is exactly
  * what drives the paper's WB-specific observations.
  */
final case class GraphProfile(
    name: String,
    nComm: Int,
    commSize: Int,
    intraDegree: Double,
    nBursts: Int,
    burstFan: Int,
    nSingles: Int,
    seed: Long,
)

object Workloads {
  val UK = GraphProfile("UK", 140, 80, 6.0, 500, 4, 1200, 11)
  val IT = GraphProfile("IT", 150, 90, 6.5, 550, 4, 1500, 12)
  val SK = GraphProfile("SK", 160, 100, 7.5, 600, 4, 1800, 13)
  // WB: few, very large, *marginally* dense communities — enough boundary
  // vertices that Definition 2 barely holds, which reproduces the paper's
  // WB anomalies (huge subgraphs make shortcut updates expensive)
  val WB = GraphProfile("WB", 16, 700, 5.0, 110, 4, 380, 14)
  val all: Seq[GraphProfile] = Seq(UK, IT, SK, WB)

  def build(spark: SparkSession, p: GraphProfile, scale: Double = 1.0): GraphState = {
    val nComm = math.max(2, (p.nComm * scale).toInt)
    val df = SynthData.communityGraph(spark, nComm, p.commSize, p.intraDegree,
      math.max(1, (p.nBursts * scale).toInt), p.burstFan,
      math.max(1, (p.nSingles * scale).toInt), p.seed)
    GraphState.fromDF(df)
  }

  /** ΔG with `nAdd` random insertions and `nDel` random deletions of
    * existing edges (the paper's default edge-update workload).
    */
  def randomDelta(g: GraphState, nAdd: Int, nDel: Int, seed: Long): GraphDelta = {
    val rnd = new Random(seed)
    val verts = g.vertices.toArray.sorted
    val edges = g.edges.toArray
    val dels = rnd.shuffle(edges.indices.toList).take(nDel)
      .map(i => EdgeUpdate(edges(i).src, edges(i).dst, 0.0, isAdd = false))
    val adds = (1 to nAdd).map { _ =>
      EdgeUpdate(verts(rnd.nextInt(verts.length)), verts(rnd.nextInt(verts.length)),
        (rnd.nextInt(10) + 1).toDouble, isAdd = true)
    }
    GraphDelta(rnd.shuffle(dels ++ adds))
  }

  /** Vertex-update workload (Figure 5e): added vertices arrive with a few
    * edges each; deleted vertices drop all incident edges.
    */
  def vertexDelta(g: GraphState, nAddV: Int, nDelV: Int, edgesPer: Int, seed: Long): GraphDelta = {
    val rnd = new Random(seed)
    val verts = g.vertices.toArray.sorted
    val maxId = verts.last
    val adds = (1 to nAddV).flatMap { k =>
      val nv = maxId + k
      (1 to edgesPer).flatMap { _ =>
        val other = verts(rnd.nextInt(verts.length))
        Seq(
          EdgeUpdate(nv, other, (rnd.nextInt(10) + 1).toDouble, isAdd = true),
          EdgeUpdate(other, nv, (rnd.nextInt(10) + 1).toDouble, isAdd = true),
        )
      }
    }
    val victims = rnd.shuffle(verts.toList).take(nDelV).toSet
    val dels = g.edges.collect {
      case e if victims.contains(e.src) || victims.contains(e.dst) =>
        EdgeUpdate(e.src, e.dst, 0.0, isAdd = false)
    }.toSeq
    GraphDelta(adds ++ dels)
  }
}
