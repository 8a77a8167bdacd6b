package repro.layph

import scala.collection.mutable
import repro.core.{LocalEngine, MinPlus, VCAlgo}

/** One dense subgraph of the lower layer, plus Layph's memoized per-
  * subgraph decomposition.
  *
  * For every tracked entry e and member v we memoize the shortcut weight
  * `rows(e)(v)` of Definition 3 (for v = e it includes the k = 0 identity
  * term, i.e. `one` plus any returning mass), the local contribution
  * `lvec(v)` of the subgraph's own root messages M0 propagated strictly
  * inside E_i, and the accumulated external inbox `mHist(e)` of each entry.
  * Both semirings then satisfy the exact decomposition
  *
  *   x_v = lvec(v) (+) SUM_e mHist(e) (x) rows(e)(v)
  *
  * ((+)=G, (x)=F) which is how revision-message upload (Equation 7) and
  * assignment (Equation 10) are computed without touching internal edges.
  */
final case class SubgraphData(
    id: Int,
    verts: Array[Long],                 // sorted members (incl. proxies)
    idx: Map[Long, Int],                // global id -> local index
    adj: Array[Array[(Int, Double)]],   // algo-weighted E_i over local indices
    entries: Array[Long],               // tracked entries (monotone growing)
    exits: Array[Long],                 // tracked exits (monotone growing)
    rows: Array[Array[Double]],         // rows(k)(j): shortcut entries(k) -> verts(j)
    lvec: Array[Double],                // L(j)
    mHist: Array[Double],               // accumulated external inbox per entry k
) {
  def entryIndex(e: Long): Int = entries.indexOf(e)
  def internals(roleEntries: Set[Long], roleExits: Set[Long]): Array[Long] =
    verts.filterNot(v => roleEntries.contains(v) || roleExits.contains(v))
}

object Subgraphs {

  /** Extracts the structural part of subgraph `i` from the effective
    * adjacency (edges with both endpoints in the subgraph).
    */
  def structure(
      i: Int,
      members: Array[Long],
      effAdj: Map[Long, Array[(Long, Double)]],
      memb: mutable.LongMap[Int],
  ): (Array[Long], Map[Long, Int], Array[Array[(Int, Double)]]) = {
    val verts = members.sorted
    val idx = verts.zipWithIndex.map { case (v, j) => v -> j }.toMap
    val adj = Array.fill(verts.length)(Array.empty[(Int, Double)])
    verts.indices.foreach { j =>
      effAdj.get(verts(j)).foreach { outs =>
        adj(j) = outs.collect { case (t, w) if memb.get(t).contains(i) => (idx(t), w) }
      }
    }
    (verts, idx, adj)
  }

  /** Shortcut rows (Equation 6) and the local root-mass vector L, both by
    * local iterative computation with [[LocalEngine]]. Pure function of the
    * subgraph structure — it is what executors run in parallel, and what
    * "layered graph update" recomputes for subgraphs hit by ΔG.
    *
    * @param m0vec per-local-vertex root message M0 (PageRank's 1-d for real
    *              vertices, 0 for proxies — phantoms carry no mass); empty
    *              when no subgraph member roots (MinPlus, PHP)
    * @return      (rows, lvec, edge activations spent)
    */
  def computeRowsAndL(
      algo: VCAlgo,
      adj: Array[Array[(Int, Double)]],
      entryIdxs: Array[Int],
      m0vec: Array[Double],
  ): (Array[Array[Double]], Array[Double], Long) = {
    val n = adj.length
    val longAdj: Array[Array[(Long, Double)]] =
      adj.map(_.map { case (t, w) => (t.toLong, w) })
    val lookup: Long => Array[(Long, Double)] = v => longAdj(v.toInt)
    var acts = 0L

    val rows = entryIdxs.map { e =>
      val states = mutable.LongMap.empty[Double]
      val run = LocalEngine.run(algo, lookup, states, Seq(e.toLong -> algo.one))
      acts += run.stats.activations
      Array.tabulate(n)(j => states.getOrElse(j.toLong, if (algo.kind == MinPlus) algo.defaultState else 0.0))
    }

    val lvec =
      if (algo.kind == MinPlus || m0vec.isEmpty) Array.fill(n)(algo.defaultState)
      else {
        val states = mutable.LongMap.empty[Double]
        val seeds = (0 until n).collect { case j if m0vec(j) != 0.0 => j.toLong -> m0vec(j) }
        val run = LocalEngine.run(algo, lookup, states, seeds)
        acts += run.stats.activations
        Array.tabulate(n)(j => states.getOrElse(j.toLong, 0.0))
      }
    (rows, lvec, acts)
  }

  /** Incremental shortcut/L update (Section IV-B, "weight update"): instead
    * of rebuilding every row from scratch, revise each memoized row against
    * the subgraph's local edge changes.
    *
    *  - SumTimes rows (and L) are linear in the messages, so the exact
    *    revision is a local delta propagation seeded with
    *    `row(u) * (w_new - w_old)` per changed edge (u, v) — Ingress's
    *    memoization-free scheme applied *inside* the subgraph.
    *  - MinPlus rows re-run from the entry only when a removed/upweighted
    *    edge actually supported the row (`row(u) + w_old = row(v)`);
    *    insertions/decreases are just local seeds.
    *
    * This is what keeps Layph's layered-graph-update activations
    * proportional to the change, not to the subgraph count (the paper's
    * Figure 6 behaviour).
    *
    * @param changes local-index edge diffs (u, v, wOld, wNew) with the
    *                no-edge weight being the semiring zero-weight
    *                (+inf for MinPlus, 0 for SumTimes)
    * @return (new rows, new lvec, activations)
    */
  def updateRowsAndL(
      algo: VCAlgo,
      adj: Array[Array[(Int, Double)]],
      entryIdxs: Array[Int],
      oldRows: Array[Array[Double]],
      oldL: Array[Double],
      changes: Array[(Int, Int, Double, Double)],
      m0vec: Array[Double],
  ): (Array[Array[Double]], Array[Double], Long) = {
    val n = adj.length
    val minPlus = algo.kind == MinPlus
    val longAdj: Array[Array[(Long, Double)]] =
      adj.map(_.map { case (t, w) => (t.toLong, w) })
    val lookup: Long => Array[(Long, Double)] = v => longAdj(v.toInt)
    var acts = 0L
    @inline def tol(x: Double) = 1e-9 * math.max(1.0, math.abs(x))

    // reverse NEW adjacency + OLD adjacency (changes undone), built lazily:
    // only MinPlus rows with broken support need them
    lazy val rin: Array[Array[(Int, Double)]] = {
      val b = Array.fill(n)(mutable.ArrayBuffer.empty[(Int, Double)])
      (0 until n).foreach(u => adj(u).foreach { case (v, w) => b(v) += ((u, w)) })
      b.map(_.toArray)
    }
    lazy val oldAdj: Array[Array[(Int, Double)]] = {
      val m = adj.map(outs => mutable.LongMap.from(outs.map { case (v, w) => (v.toLong, w) }))
      changes.foreach { case (u, v, wo, _) =>
        if (wo.isFinite && wo != 0.0) m(u)(v.toLong) = wo else m(u).remove(v.toLong)
      }
      m.map(_.iterator.map { case (v, w) => (v.toInt, w) }.toArray)
    }

    def reviseVector(vec: Array[Double], entry: Int): Array[Double] = {
      if (minPlus) {
        // cancellation (⊥ of Example 3): a removed/upweighted edge broke the
        // row iff it supported its head — invalidate the old-graph tight
        // closure and re-derive it, the memoization-path scheme applied
        // locally inside the subgraph
        val broken = changes.collect {
          case (u, v, wo, wn) if wn > wo && vec(u).isFinite &&
            math.abs(vec(u) + wo - vec(v)) <= tol(vec(v)) => v
        }
        val states = mutable.LongMap.empty[Double]
        vec.indices.foreach(j => states(j.toLong) = vec(j))
        val seeds = mutable.LongMap.empty[Double]
        def offer(v: Long, m: Double): Unit =
          seeds.updateWith(v) { case Some(a) => Some(math.min(a, m)); case None => Some(m) }

        if (broken.nonEmpty) {
          val invalid = mutable.Set.empty[Int]
          val queue = mutable.Queue.empty[Int]
          broken.foreach { v => if (invalid.add(v)) queue += v }
          while (queue.nonEmpty) {
            val a = queue.dequeue()
            oldAdj(a).foreach { case (b, w) =>
              if (!invalid.contains(b) && vec(a).isFinite &&
                  math.abs(vec(a) + w - vec(b)) <= tol(vec(b))) {
                invalid += b; queue += b
              }
            }
          }
          invalid.foreach(j => states(j.toLong) = algo.defaultState)
          if (entry >= 0 && invalid.contains(entry)) states(entry.toLong) = 0.0
          invalid.foreach { b =>
            if (b != entry) {
              acts += rin(b).length
              rin(b).foreach { case (a, w) =>
                if (!invalid.contains(a)) {
                  val xa = states.getOrElse(a.toLong, algo.defaultState)
                  if (xa.isFinite) offer(b.toLong, xa + w)
                }
              }
            }
          }
        }
        changes.foreach { case (u, v, _, wn) =>
          if (wn.isFinite && states.getOrElse(u.toLong, algo.defaultState).isFinite)
            offer(v.toLong, states(u.toLong) + wn)
        }
        if (seeds.isEmpty && broken.isEmpty) vec
        else {
          val run = LocalEngine.run(algo, lookup, states, seeds.toSeq)
          acts += run.stats.activations + changes.length
          Array.tabulate(n)(j => states.getOrElse(j.toLong, algo.defaultState))
        }
      } else {
        val seeds = changes.collect {
          case (u, v, wo, wn) if vec(u) * (wn - wo) != 0.0 => v.toLong -> vec(u) * (wn - wo)
        }
        if (seeds.isEmpty) vec
        else {
          val states = mutable.LongMap.empty[Double]
          vec.indices.foreach(j => states(j.toLong) = vec(j))
          val run = LocalEngine.run(algo, lookup, states, seeds)
          acts += run.stats.activations + changes.length
          Array.tabulate(n)(j => states.getOrElse(j.toLong, 0.0))
        }
      }
    }

    val rows = entryIdxs.indices.map { k =>
      if (oldRows(k).isEmpty) {
        // a brand-new entry has no memoized row yet — deduce it fresh
        val states = mutable.LongMap.empty[Double]
        val run = LocalEngine.run(algo, lookup, states, Seq(entryIdxs(k).toLong -> algo.one))
        acts += run.stats.activations
        Array.tabulate(n)(j => states.getOrElse(j.toLong, if (minPlus) algo.defaultState else 0.0))
      } else reviseVector(oldRows(k), entryIdxs(k))
    }.toArray

    val lvec =
      if (minPlus || m0vec.isEmpty) Array.fill(n)(algo.defaultState)
      else reviseVector(oldL, -1)
    (rows, lvec, acts)
  }

  /** Assignment (Equation 10): revises internal states straight through the
    * shortcuts, with no iterative computation.
    *
    * @param mNew     per-entry total external inbox (mHist + this round's ΔM)
    * @param deltaM   this round's per-entry inbox change
    * @param affected whether E_i changed this round (forces full recompute
    *                 from the decomposition instead of a delta update)
    * @param current  current states of the internal vertices (delta path)
    * @return         (internal vertex, new state) pairs + activations spent
    */
  def assignInternal(
      algo: VCAlgo,
      sg: SubgraphData,
      internalIdxs: Array[Int],
      mNew: Array[Double],
      deltaM: Array[Double],
      affected: Boolean,
      current: Array[Double],
  ): (Array[(Long, Double)], Long) = {
    val minPlus = algo.kind == MinPlus
    var acts = 0L
    val out = new Array[(Long, Double)](internalIdxs.length)
    var jj = 0
    while (jj < internalIdxs.length) {
      val j = internalIdxs(jj)
      val x: Double =
        if (minPlus) {
          var best = sg.lvec(j)
          var k = 0
          while (k < sg.entries.length) {
            val cand = algo.gen(mNew(k), sg.rows(k)(j))
            if (cand < best) best = cand
            k += 1
          }
          acts += sg.entries.length
          best
        } else if (affected) {
          var s = sg.lvec(j)
          var k = 0
          while (k < sg.entries.length) { s += mNew(k) * sg.rows(k)(j); k += 1 }
          acts += sg.entries.length
          s
        } else {
          var s = current(jj)
          var k = 0
          while (k < sg.entries.length) {
            if (deltaM(k) != 0.0) { s += deltaM(k) * sg.rows(k)(j); acts += 1 }
            k += 1
          }
          s
        }
      out(jj) = (sg.verts(j), x)
      jj += 1
    }
    (out, acts)
  }
}
