package repro.core

/** Common contract of every (incremental) graph processing system in this
  * repo: one offline/batch phase, then repeated incremental updates.
  * `initialize` memoizes whatever the system needs (converged states,
  * dependency trees, per-iteration values, Layph's layered graph) and
  * `update` must satisfy Equation 4: its output equals a batch run on the
  * updated graph. The correctness suites assert exactly that.
  */
trait IncrementalSystem {
  def name: String
  def initialize(g0: GraphState, algo: VCAlgo): SparkRun
  def update(delta: GraphDelta): SparkRun
}
