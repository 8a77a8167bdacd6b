package repro.baselines

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.ingress.{MinIncSystem, SumIncSystem}

/** Restart: recompute the updated graph from scratch — the lower bound on
  * memoization every incremental system is measured against (Figure 1).
  */
final class RestartEngine(spark: SparkSession, partitions: Int = 8) extends IncrementalSystem {
  val name = "Restart"
  private val engine = new SparkEngine(spark, partitions)
  private var g: GraphState = _
  private var algo: VCAlgo = _
  def initialize(g0: GraphState, a: VCAlgo): SparkRun = {
    // Restart memoizes nothing; every update recomputes from scratch.
    g = g0.copyGraph(); algo = a
    SparkRun(scala.collection.mutable.LongMap.empty[Double], RunStats(0, 0, 0))
  }
  def update(delta: GraphDelta): SparkRun = {
    g.applyDelta(delta)
    engine.batch(algo, g)
  }
}

/** KickStarter (ASPLOS'17), modeled: dependency-tree memoization with
  * *conservative* value-based trimming — the invalidated region is the
  * forward-reachable over-approximation of the unsafe subtree, so more
  * states are reset and re-derived than strictly necessary.
  */
final class KickStarterEngine(spark: SparkSession, partitions: Int = 8)
  extends MinIncSystem("KickStarter", spark, partitions, conservative = true)

/** RisGraph (SIGMOD'21), modeled: classifies every unit update as
  * safe/unsafe against the memoized tree (counted as activations) and
  * feeds updates through its per-update pipeline — here a short sequence
  * of insertion rounds after a sound deletion round.
  */
final class RisGraphEngine(spark: SparkSession, partitions: Int = 8)
  extends MinIncSystem("RisGraph", spark, partitions, insertRounds = 2, classifyCost = true)

/** GraphBolt (EuroSys'19), modeled: refines the memoized per-iteration
  * aggregation values epoch by epoch — every nonzero change is tracked and
  * re-propagated (threshold 0), for as many synchronous epochs as the
  * batch run took. Matches the observation of Figure 1 that its activation
  * count approaches Restart on accumulative workloads.
  */
final class GraphBoltEngine(spark: SparkSession, partitions: Int = 8)
  extends SumIncSystem("GraphBolt", spark, partitions,
    thresholdOf = _ => 0.0, capToBatchEpochs = true)

/** DZiG (EuroSys'21), modeled: GraphBolt plus sparsity-aware change
  * detection — change propagation stops once deltas fall well below the
  * algorithm's tolerance (eps/10: sparser than GraphBolt, but still finer
  * than Ingress's memoization-free engine).
  */
final class DZiGEngine(spark: SparkSession, partitions: Int = 8)
  extends SumIncSystem("DZiG", spark, partitions,
    thresholdOf = a => a.eps / 10.0, capToBatchEpochs = true)
