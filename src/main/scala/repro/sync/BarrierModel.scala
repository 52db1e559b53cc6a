package repro.sync

/** Synchronization models compared in the paper (Section 3.3 / Fig. 6d).
  *
  * The paper's workers call `barrierSynch(q, w)` on the controller after each
  * iteration and wait for `barrierReady(q)`; the three models differ in *who*
  * must rendezvous:
  */
sealed trait BarrierMode { def name: String }

object BarrierMode {

  /** Traditional BSP-like synchronisation — the Fig. 6d baseline: one
    * barrier per iteration shared by *all* queries and *all* workers.
    * Queries advance in lock-step, so every query waits for the slowest
    * query in the batch after every iteration (the straggler problem of
    * Section 3.3).
    */
  case object SharedGlobal extends BarrierMode { val name = "BSP-global" }

  /** The state-of-the-art decoupled model of Seraph [44]: an independent
    * barrier per query, but each barrier still spans all k workers — even
    * workers that execute no vertex of the query.
    */
  case object PerQueryGlobal extends BarrierMode { val name = "per-query-global" }

  /** The paper's hybrid barrier: per-query barriers *limited* to the workers
    * currently involved in the query; a query living on a single worker uses
    * a communication-free local barrier. Global STOP/START barriers are used
    * only for repartitioning (accounted by the runner, not per iteration).
    */
  case object Hybrid extends BarrierMode { val name = "hybrid" }
}
