package repro.sim

import repro.sync.BarrierMode
import scala.collection.mutable

/** Simulated outcome of one batch.
  *
  * @param latency  per-query latency: time from batch start (= query
  *                 scheduling) until the query's last barrier completes —
  *                 the paper's query-latency definition (last minus first
  *                 instant with an active vertex)
  * @param makespan time until the whole batch drains
  */
final case class BatchSim(latency: Map[Int, Double], makespan: Double) {
  def sumLatency: Double = latency.valuesIterator.sum
  def avgLatency: Double = if (latency.isEmpty) 0.0 else sumLatency / latency.size
}

/** Trace-driven discrete-event simulator of the Q-Graph runtime.
  *
  * Workers are modelled as processor-sharing servers: in every instant a
  * worker's compute capacity is split equally among the queries that
  * currently have pending vertex work on it. This reproduces the contention
  * effects the paper observes (straggler problems on imbalanced Domain
  * partitions, Berlin's worker serialising its queries) without modelling
  * individual threads.
  *
  * One iteration of one query proceeds as: compute phase (vertex work on
  * every involved worker, processor-shared) -> communication (per-pair batch
  * flush + per-message cost for cross-worker messages) -> barrier (cost
  * depends on the synchronisation model, see [[repro.sync.BarrierMode]]).
  *
  * Under [[BarrierMode.SharedGlobal]] all queries advance in lock-step
  * rounds and share a single global barrier per round; under the decoupled
  * modes each query runs its own iteration clock.
  */
object LatencySimulator {

  private val Eps = 1e-12

  /** Compute + post-compute delay of one iteration of one query. */
  private final case class IterCost(computeByWorker: Array[(Int, Double)], postDelay: Double)

  private def commCost(stat: QueryIterStat, c: CostModel): Double =
    if (stat.remoteMsgs.isEmpty) 0.0
    else c.tFlushPair * stat.remoteMsgs.size + c.tMsgRemote * stat.totalRemote

  private def barrierCost(stat: QueryIterStat, k: Int, mode: BarrierMode, c: CostModel): Double =
    mode match {
      case BarrierMode.Hybrid =>
        if (stat.isLocal) c.tBarrierLocal
        else c.tBarrierBase + c.tBarrierPerWorker * stat.involvedWorkers.size
      case BarrierMode.PerQueryGlobal | BarrierMode.SharedGlobal =>
        c.tBarrierBase + c.tBarrierPerWorker * k
    }

  /** Simulates one batch. `stats` must come from `IterationStats.compute`. */
  def simulateBatch(
      stats: Vector[QueryIterStat],
      k: Int,
      mode: BarrierMode,
      c: CostModel): BatchSim = {
    val perQuery: Map[Int, Vector[IterCost]] =
      IterationStats.byQuery(stats).map { case (qid, its) =>
        qid -> its.map { s =>
          // Every involved worker (computing or receiving) pays the fixed
          // per-(query, iteration) participation cost plus per-vertex work.
          val comp = s.involvedWorkers.toArray.map { w =>
            (w, c.tIterWorker + s.actByWorker.getOrElse(w, 0) * c.tVertex)
          }
          // Under the shared-global model the barrier is paid once per round
          // (in `simulateLockstep`), not per query.
          val barrier = if (mode == BarrierMode.SharedGlobal) 0.0 else barrierCost(s, k, mode, c)
          IterCost(comp, commCost(s, c) + barrier)
        }
      }
    mode match {
      case BarrierMode.SharedGlobal => simulateLockstep(perQuery, stats, k, c)
      case _ => simulateDecoupled(perQuery)
    }
  }

  /** Decoupled modes: every query is an independent job over its iteration
    * list; workers are processor-shared among queries in their compute phase.
    */
  private def simulateDecoupled(perQuery: Map[Int, Vector[IterCost]]): BatchSim = {
    final class QState(val qid: Int, val iters: Vector[IterCost]) {
      var idx = 0
      var remaining: mutable.HashMap[Int, Double] = _
      var wakeAt: Double = Double.NaN // NaN = computing
      var doneAt: Double = Double.NaN
      def done: Boolean = !doneAt.isNaN
      def computing: Boolean = !done && wakeAt.isNaN
      def startIter(): Unit = {
        remaining = mutable.HashMap.from(iters(idx).computeByWorker.filter(_._2 > 0))
        wakeAt = Double.NaN
      }
    }
    val qs = perQuery.toVector.sortBy(_._1).map { case (qid, its) => new QState(qid, its) }
    qs.foreach(_.startIter())
    var t = 0.0
    var nDone = 0
    while (nDone < qs.length) {
      // Wake queries whose comm+barrier delay elapsed.
      for (q <- qs if !q.done && !q.wakeAt.isNaN && q.wakeAt <= t + Eps) {
        q.idx += 1
        if (q.idx >= q.iters.length) { q.doneAt = q.wakeAt; nDone += 1 }
        else q.startIter()
      }
      if (nDone >= qs.length) ()
      else {
        // Defensive: an iteration with no compute work goes straight to its
        // comm + barrier delay (cannot occur for engine traces, where every
        // iteration has >= 1 active vertex).
        for (q <- qs if q.computing && q.remaining.isEmpty)
          q.wakeAt = t + q.iters(q.idx).postDelay
        val computing = qs.filter(_.computing)
        if (computing.isEmpty) {
          t = qs.iterator.filter(q => !q.done && !q.wakeAt.isNaN).map(_.wakeAt).min
        } else {
          // Processor sharing: worker w serves nShare(w) queries at rate 1/n.
          val nShare = mutable.HashMap.empty[Int, Int]
          for (q <- computing; (w, r) <- q.remaining if r > Eps)
            nShare(w) = nShare.getOrElse(w, 0) + 1
          var dt = Double.PositiveInfinity
          for (q <- computing; (w, r) <- q.remaining if r > Eps)
            dt = math.min(dt, r * nShare(w))
          for (q <- qs if !q.done && !q.wakeAt.isNaN)
            dt = math.min(dt, q.wakeAt - t)
          require(dt > 0 && dt.isFinite, s"simulator stalled at t=$t (dt=$dt)")
          for (q <- computing; (w, r) <- q.remaining if r > Eps) {
            val nr = r - dt / nShare(w)
            q.remaining(w) = if (nr < Eps) 0.0 else nr
          }
          t += dt
          for (q <- computing if q.remaining.valuesIterator.forall(_ <= Eps))
            q.wakeAt = t + q.iters(q.idx).postDelay
        }
      }
    }
    BatchSim(qs.map(q => q.qid -> q.doneAt).toMap, if (qs.isEmpty) 0.0 else qs.map(_.doneAt).max)
  }

  /** Shared-global BSP: round r runs iteration r of every query that has
    * one, processor-shared; the round ends with a single global barrier all
    * running queries wait on. Communication of different queries overlaps
    * (the round pays the max, not the sum).
    */
  private def simulateLockstep(
      perQuery: Map[Int, Vector[IterCost]],
      stats: Vector[QueryIterStat],
      k: Int,
      c: CostModel): BatchSim = {
    val maxIters = if (perQuery.isEmpty) 0 else perQuery.valuesIterator.map(_.length).max
    val latency = mutable.HashMap.empty[Int, Double]
    var t = 0.0
    val globalBarrier = c.tBarrierBase + c.tBarrierPerWorker * k
    var r = 0
    while (r < maxIters) {
      val round = perQuery.toVector.filter(_._2.length > r)
      val work = round.map(_._2(r).computeByWorker)
      t += psMakespan(work)
      t += (if (round.isEmpty) 0.0 else round.iterator.map(_._2(r).postDelay).max)
      t += globalBarrier
      for ((qid, its) <- round if its.length == r + 1) latency(qid) = t
      r += 1
    }
    BatchSim(latency.toMap, t)
  }

  /** Makespan of a set of jobs' compute demands under per-worker processor
    * sharing (all jobs start together, no further phases).
    */
  private def psMakespan(jobs: Vector[Array[(Int, Double)]]): Double = {
    val rem = jobs.map(j => mutable.HashMap.from(j.filter(_._2 > 0)))
    var t = 0.0
    var active = rem.count(_.nonEmpty)
    while (active > 0) {
      val nShare = mutable.HashMap.empty[Int, Int]
      for (j <- rem; (w, r) <- j if r > Eps) nShare(w) = nShare.getOrElse(w, 0) + 1
      var dt = Double.PositiveInfinity
      for (j <- rem; (w, r) <- j if r > Eps) dt = math.min(dt, r * nShare(w))
      if (!dt.isFinite) return t
      for (j <- rem; (w, r) <- j if r > Eps) {
        val nr = r - dt / nShare(w)
        if (nr < Eps) j.remove(w) else j(w) = nr
      }
      t += dt
      active = rem.count(_.exists(_._2 > Eps))
    }
    t
  }
}
