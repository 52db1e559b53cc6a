package repro.sim

/** Cost constants of the trace-driven runtime simulator, in simulated
  * seconds. The absolute values are calibrated so that the *relative*
  * behaviour of the paper's testbed is reproduced (loopback/1-GbE TCP
  * between worker processes, 32-message batches, a controller round-trip per
  * non-local barrier); absolute latencies are not comparable to the paper's
  * hardware and are reported as simulated time.
  *
  * @param tVertex           compute time per active vertex (vertex function
  *                          execution incl. message combining)
  * @param tIterWorker       fixed cost a worker pays per (query, iteration)
  *                          it participates in — iteration scheduling,
  *                          inbox scan, message deserialisation, barrier
  *                          handling. This is the term that makes locality
  *                          a *throughput* win: a query split across w
  *                          workers consumes w times this budget per
  *                          iteration, while a local query consumes it once
  *                          (and it is what queues up on an overloaded
  *                          worker — the paper's straggler effect)
  * @param tMsgRemote        marginal cost per remote vertex message
  *                          (serialisation + TCP/IP stack + transfer)
  * @param tFlushPair        fixed cost per (sender, receiver) worker pair
  *                          that exchanges at least one message in an
  *                          iteration (batch flush + wakeup)
  * @param tBarrierBase      controller round-trip to coordinate a non-local
  *                          barrier
  * @param tBarrierPerWorker marginal barrier cost per participating worker
  * @param tBarrierLocal     communication-free local barrier (in-memory)
  * @param tGlobalStopStart  STOP + START global barrier enclosing a
  *                          repartitioning (Section 3.3)
  * @param tMovePerVertex    cost per vertex moved during repartitioning
  */
final case class CostModel(
    tVertex: Double = 2e-4,
    tIterWorker: Double = 2.5e-3,
    tMsgRemote: Double = 1e-5,
    tFlushPair: Double = 1e-3,
    tBarrierBase: Double = 5e-4,
    tBarrierPerWorker: Double = 2e-4,
    tBarrierLocal: Double = 2e-5,
    tGlobalStopStart: Double = 5e-3,
    tMovePerVertex: Double = 2e-6) {
  require(tVertex > 0 && tMsgRemote >= 0 && tFlushPair >= 0)
  require(tBarrierLocal <= tBarrierBase + tBarrierPerWorker,
    "a local barrier must not cost more than a distributed one")
}

object CostModel {
  /** The calibrated default used by all benches. */
  val default: CostModel = CostModel()
}
