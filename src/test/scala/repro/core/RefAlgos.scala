package repro.core

import scala.collection.mutable

/** Independent reference implementations the engines are tested against —
  * textbook algorithms with none of the engines' machinery (no message
  * passing, no semiring plumbing), so an engine bug cannot hide in a
  * shared abstraction.
  */
object RefAlgos {

  /** Dijkstra over the raw weighted graph. */
  def dijkstra(g: GraphState, source: Long): Map[Long, Double] = {
    val dist = mutable.HashMap.empty[Long, Double].withDefaultValue(Double.PositiveInfinity)
    val pq = mutable.PriorityQueue.empty[(Double, Long)](Ordering.by(-_._1))
    dist(source) = 0.0
    pq.enqueue((0.0, source))
    while (pq.nonEmpty) {
      val (d, u) = pq.dequeue()
      if (d <= dist(u)) {
        g.out.get(u).foreach(_.foreach { case (v, w) =>
          if (d + w < dist(v)) { dist(v) = d + w; pq.enqueue((d + w, v)) }
        })
      }
    }
    g.vertices.map(v => v -> dist(v)).toMap
  }

  /** BFS hop counts. */
  def bfsHops(g: GraphState, source: Long): Map[Long, Double] = {
    val dist = mutable.HashMap.empty[Long, Double].withDefaultValue(Double.PositiveInfinity)
    val q = mutable.Queue(source)
    dist(source) = 0.0
    while (q.nonEmpty) {
      val u = q.dequeue()
      g.out.get(u).foreach(_.keysIterator.foreach { v =>
        if (!dist.contains(v) || dist(v).isInfinite) { dist(v) = dist(u) + 1; q += v }
      })
    }
    g.vertices.map(v => v -> dist(v)).toMap
  }

  /** Power-iteration PageRank (dangling mass leaks, matching delta-PR). */
  def pageRank(g: GraphState, d: Double = 0.85, iters: Int = 200): Map[Long, Double] = {
    val verts = g.vertices.toArray.sorted
    val idx = verts.zipWithIndex.toMap
    var x = Array.fill(verts.length)(1.0 - d)
    for (_ <- 1 to iters) {
      val nx = Array.fill(verts.length)(1.0 - d)
      verts.indices.foreach { i =>
        g.out.get(verts(i)).foreach { outs =>
          if (outs.nonEmpty) {
            val c = d * x(i) / outs.size
            outs.keysIterator.foreach(v => nx(idx(v)) += c)
          }
        }
      }
      x = nx
    }
    verts.indices.map(i => verts(i) -> x(i)).toMap
  }

  /** PHP: decayed weight-normalized walk mass from a pinned root; walks
    * re-entering the root die. Fixed-point by synchronous iteration.
    */
  def php(g: GraphState, source: Long, d: Double = 0.85, iters: Int = 400): Map[Long, Double] = {
    val verts = g.vertices.toArray.sorted
    val idx = verts.zipWithIndex.toMap
    var x = Array.fill(verts.length)(0.0)
    x(idx(source)) = 1.0
    for (_ <- 1 to iters) {
      val nx = Array.fill(verts.length)(0.0)
      nx(idx(source)) = 1.0
      verts.indices.foreach { i =>
        g.out.get(verts(i)).foreach { outs =>
          if (outs.nonEmpty) {
            val sw = outs.valuesIterator.sum
            outs.foreach { case (v, w) =>
              if (v != source) nx(idx(v)) += d * w / sw * x(i)
            }
          }
        }
      }
      x = nx
    }
    verts.indices.map(i => verts(i) -> x(i)).toMap
  }
}
