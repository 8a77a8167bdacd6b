package repro.core

import scala.collection.mutable

/** Result of one engine run. */
final case class RunStats(
    iterations: Int,
    activations: Long,
    wallMs: Long,
    phases: Seq[(String, Long)] = Nil,
) {
  def +(o: RunStats): RunStats =
    RunStats(iterations + o.iterations, activations + o.activations, wallMs + o.wallMs, phases ++ o.phases)
}

final case class LocalRun(states: mutable.LongMap[Double], stats: RunStats)

/** Single-threaded accumulative engine over an in-memory adjacency.
  *
  * This is the workhorse of Layph's *local* computations: shortcut
  * deduction (Equation 6), revision-message upload, and per-subgraph
  * recomputation all run this engine inside executor tasks — disjoint
  * subgraphs are processed in parallel as Spark tasks, exactly the
  * parallelism structure the paper describes. It is also the reference
  * implementation the Spark engine is tested against.
  *
  * Semantics (both kinds): pending messages are aggregated per vertex
  * with G; applying a message to `x_v` either lowers it (MinPlus, emitting
  * the improved value) or adds to it (SumTimes, emitting the delta when
  * `|delta| >= emitThreshold`). Messages generated towards absorbing
  * vertices are dropped before aggregation (PHP kills walks re-entering
  * the root), while explicit seeds are always delivered — that is how the
  * root's initial message M0 pins its own state. This is the accumulative
  * model of Equation 1.
  */
object LocalEngine {

  /** @param states  initial vertex states, mutated in place
    * @param seeds   initial pending messages (vertex -> message), G-aggregated
    * @return        the mutated states plus iteration/activation counts
    */
  def run(
      algo: VCAlgo,
      adj: Long => Array[(Long, Double)],
      states: mutable.LongMap[Double],
      seeds: Iterable[(Long, Double)],
      emitThreshold: Double = Double.NaN,
      absorbing: Set[Long] = Set.empty,
      maxIter: Int = Int.MaxValue,
  ): LocalRun = {
    val t0  = System.nanoTime()
    val thr = if (emitThreshold.isNaN) algo.eps else emitThreshold
    var frontier = mutable.LongMap.empty[Double]
    seeds.foreach { case (v, m) =>
      frontier.updateWith(v) { case Some(a) => Some(algo.agg(a, m)); case None => Some(m) }
    }
    var acts  = 0L
    var iters = 0
    val minPlus = algo.kind == MinPlus

    while (frontier.nonEmpty && iters < maxIter) {
      iters += 1
      val next = mutable.LongMap.empty[Double]
      frontier.foreach { case (v, m) =>
        // apply G to the vertex state, decide what (if anything) to re-emit
        val emit: Double =
          if (minPlus) {
            val x = states.getOrElse(v, algo.defaultState)
            if (m < x) { states(v) = m; m } else algo.zero
          } else {
            states(v) = states.getOrElse(v, 0.0) + m
            if (math.abs(m) >= thr) m else algo.zero
          }
        // generate F over out-edges
        if (emit != algo.zero) {
          val out = adj(v)
          if (out != null && out.nonEmpty) {
            acts += out.length
            var i = 0
            while (i < out.length) {
              val (d, w) = out(i)
              if (!absorbing.contains(d)) {
                val msg = algo.gen(emit, w)
                next.updateWith(d) { case Some(a) => Some(algo.agg(a, msg)); case None => Some(msg) }
              }
              i += 1
            }
          }
        }
      }
      frontier = next
    }
    LocalRun(states, RunStats(iters, acts, (System.nanoTime() - t0) / 1000000))
  }

  /** Batch run from the algorithm's own M0 (Equation 1 until convergence). */
  def batch(algo: VCAlgo, g: GraphState, maxIter: Int = Int.MaxValue): LocalRun = {
    val adjMap = g.adjacency(algo)
    val states = mutable.LongMap.empty[Double]
    g.vertices.foreach(v => states(v) = algo.defaultState)
    val seeds = algo.roots match {
      case Some(rs) => rs.toSeq.map(v => v -> algo.initMsg(v))
      case None     => g.vertices.toSeq.map(v => v -> algo.initMsg(v))
    }
    run(algo, adjMap.getOrElse(_, Array.empty), states, seeds,
      absorbing = algo.absorbing, maxIter = maxIter)
  }
}
