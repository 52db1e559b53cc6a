package repro.core

import repro.engine.BatchTrace
import repro.qcut.IlsResult
import repro.sim._
import repro.sync.BarrierMode

/** One end-to-end run configuration: an initial static partitioning, a
  * barrier model, and whether the adaptive Q-cut controller is active.
  */
final case class RunConfig(
    name: String,
    k: Int,
    barrier: BarrierMode = BarrierMode.Hybrid,
    adaptive: Boolean = false,
    cost: CostModel = CostModel.default,
    ctrl: ControllerConfig = ControllerConfig())

/** Per-batch measurements (the time series behind Figs. 5a/5b/6e/6f).
  * `loadByWorker` (activations per worker) feeds the sliding-window
  * imbalance of Fig. 6e.
  */
final case class BatchOutcome(
    batchId: Int,
    nQueries: Int,
    avgLatency: Double,
    sumLatency: Double,
    makespan: Double,
    locality: Double,
    imbalance: Double,
    loadByWorker: Map[Int, Long],
    repartitioned: Boolean,
    movedVertices: Long)

/** Full run result. `queryLatencies` is keyed by qid; `ilsRuns` holds the
  * convergence history of every triggered repartitioning (Fig. 6g uses the
  * first).
  */
final case class RunResult(
    cfg: RunConfig,
    batches: Vector[BatchOutcome],
    queryLatencies: Map[Int, Double],
    ilsRuns: Vector[IlsResult]) {
  def totalLatency: Double = queryLatencies.valuesIterator.sum
  def avgLatency: Double = if (queryLatencies.isEmpty) 0.0 else totalLatency / queryLatencies.size
  def avgLocality: Double = if (batches.isEmpty) 0.0 else batches.map(_.locality).sum / batches.size
  def repartitions: Int = batches.count(_.repartitioned)
}

/** Drives a workload's (partition-invariant) batch traces through the
  * simulated Q-Graph runtime: statistics -> latency simulation -> controller
  * MAPE loop -> optional repartitioning at a global barrier.
  *
  * Batches execute sequentially (each is "16 parallel queries", Section
  * 4.2); the simulated clock accumulates batch makespans plus, when the
  * controller repartitions, the global STOP/START barrier and the scope
  * movement cost. The ILS itself runs asynchronously to query processing
  * (Appendix A.3) and therefore does not advance the clock.
  */
object QGraphRunner {

  def run(initialAssign: Array[Int], traces: Seq[BatchTrace], cfg: RunConfig): RunResult = {
    require(traces.nonEmpty, "no traces")
    var assign = initialAssign.clone()
    val controller = new Controller(cfg.k, cfg.ctrl)
    var clock = 0.0
    val batches = Vector.newBuilder[BatchOutcome]
    val latencies = Map.newBuilder[Int, Double]
    val ilsRuns = Vector.newBuilder[IlsResult]

    for (trace <- traces) {
      val a = assign // stable snapshot for the closure
      val stats = IterationStats.compute(trace, v => a(v))
      val sim = LatencySimulator.simulateBatch(stats, cfg.k, cfg.barrier, cfg.cost)
      clock += sim.makespan
      latencies ++= sim.latency
      controller.observeBatch(trace, stats, clock)

      var repartitioned = false
      var moved = 0L
      if (cfg.adaptive && controller.shouldRepartition) {
        val outcome = controller.repartition(assign)
        // Hysteresis: enact the plan only when it buys something *relative
        // to the incumbent* — a real query-cut cost reduction, or a balance
        // repair that lowers the predicted peak worker load. Shuffling
        // scopes for a marginal gain would thrash the partitioning under a
        // drifting workload (every move is paid at a global barrier).
        val worthIt = outcome.costGainVsIncumbent >= 0.1 ||
          (outcome.rebalanced && outcome.maxLoadAfter < 0.9 * outcome.maxLoadBefore)
        if (outcome.movedVertices > 0 && worthIt) {
          assign = outcome.newAssign
          moved = outcome.movedVertices
          repartitioned = true
          ilsRuns += outcome.ils
          clock += cfg.cost.tGlobalStopStart +
            cfg.cost.tBarrierPerWorker * cfg.k +
            cfg.cost.tMovePerVertex * moved
        }
      }
      batches += BatchOutcome(
        trace.batchId, trace.queries.size,
        sim.avgLatency, sim.sumLatency, sim.makespan,
        Metrics.avgQueryLocality(stats),
        Metrics.workloadImbalance(stats, cfg.k),
        Metrics.workerLoads(stats, cfg.k),
        repartitioned, moved)
    }
    RunResult(cfg, batches.result(), latencies.result(), ilsRuns.result())
  }
}
