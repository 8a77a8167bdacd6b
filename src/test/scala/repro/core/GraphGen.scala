package repro.core

import scala.util.Random

/** Deterministic small-graph fixtures for the correctness suites. */
object GraphGen {

  /** Erdős–Rényi-ish directed weighted graph. */
  def random(n: Int, avgDeg: Double, seed: Long, maxW: Int = 10): GraphState = {
    val rnd = new Random(seed)
    val m = (n * avgDeg).toInt
    val g = GraphState.empty
    (0 until n).foreach(v => g.verts += v.toLong)
    (1 to m).foreach { _ =>
      val u = rnd.nextInt(n).toLong; val v = rnd.nextInt(n).toLong
      if (u != v) g.addEdge(u, v, (rnd.nextInt(maxW) + 1).toDouble)
    }
    g
  }

  /** Small planted-community graph (driver-side twin of
    * SynthData.communityGraph) so layered-graph tests have real dense
    * subgraphs to find.
    */
  def community(nComm: Int, commSize: Int, intraDeg: Double, nCross: Int, seed: Long,
                nBursts: Int = 6, burstFan: Int = 3): GraphState = {
    val rnd = new Random(seed)
    val g = GraphState.empty
    val n = nComm * commSize
    (0 until n).foreach(v => g.verts += v.toLong)
    (0 until nComm).foreach { c =>
      val base = c * commSize
      (1 to (commSize * intraDeg).toInt).foreach { _ =>
        val u = base + rnd.nextInt(commSize); val v = base + rnd.nextInt(commSize)
        if (u != v) g.addEdge(u, v, (rnd.nextInt(10) + 1).toDouble)
      }
    }
    (1 to nCross).foreach { _ =>
      val u = rnd.nextInt(n).toLong; val v = rnd.nextInt(n).toLong
      if (u != v) g.addEdge(u, v, (rnd.nextInt(10) + 1).toDouble)
    }
    // burst cross edges: one source firing into one foreign community —
    // the high-degree boundary pattern that vertex replication targets
    (1 to nBursts).foreach { _ =>
      val u = rnd.nextInt(n)
      val tc = rnd.nextInt(nComm)
      (1 to burstFan).foreach { _ =>
        val v = tc * commSize + rnd.nextInt(commSize)
        if (u != v) g.addEdge(u, v, (rnd.nextInt(10) + 1).toDouble)
      }
    }
    g
  }

  /** Random ΔG against a given graph. */
  def delta(g: GraphState, nAdd: Int, nDel: Int, seed: Long): GraphDelta = {
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

  /** The running example of Figure 2a: SSSP source v0, dense subgraphs
    * G2 = {v0..v4} (entry v0, exit v4) and G1 = {v5..v8} (entry/exit v5).
    * Converged SSSP states are {0,1,4,1,2,5,6,7,7}.
    */
  def figure2: GraphState = GraphState.fromEdges(Seq(
    RawEdge(0, 1, 1), RawEdge(0, 3, 1), RawEdge(1, 2, 3), RawEdge(3, 4, 1),
    RawEdge(2, 4, 1), RawEdge(4, 5, 3), RawEdge(5, 0, 2), RawEdge(5, 6, 1),
    RawEdge(6, 7, 1), RawEdge(6, 8, 1)))

  /** Figure 2b's ΔG: delete (v3, v4), add (v3, v2) with weight 2. After it,
    * SSSP states are {0,1,3,1,4,7,8,9,9}.
    */
  def figure2Delta: GraphDelta = GraphDelta(Seq(
    EdgeUpdate(3, 4, 0.0, isAdd = false),
    EdgeUpdate(3, 2, 2.0, isAdd = true)))

  def fig2States: Map[Long, Double] =
    Map(0L -> 0.0, 1L -> 1.0, 2L -> 4.0, 3L -> 1.0, 4L -> 2.0, 5L -> 5.0, 6L -> 6.0, 7L -> 7.0, 8L -> 7.0)

  def fig2UpdatedStates: Map[Long, Double] =
    Map(0L -> 0.0, 1L -> 1.0, 2L -> 3.0, 3L -> 1.0, 4L -> 4.0, 5L -> 7.0, 6L -> 8.0, 7L -> 9.0, 8L -> 9.0)
}
