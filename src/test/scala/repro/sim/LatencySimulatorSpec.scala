package repro.sim

import org.scalatest.funsuite.AnyFunSuite
import repro.sync.BarrierMode

class LatencySimulatorSpec extends AnyFunSuite {

  // Round-number cost model for exact hand computations; the fixed
  // per-(query, iteration, worker) cost is zeroed here and exercised by its
  // dedicated tests below.
  private val c = CostModel(
    tVertex = 1.0, tIterWorker = 0.0, tMsgRemote = 0.1, tFlushPair = 0.5,
    tBarrierBase = 2.0, tBarrierPerWorker = 1.0, tBarrierLocal = 0.25,
    tGlobalStopStart = 10.0, tMovePerVertex = 0.01)

  private def stat(qid: Int, iter: Int, act: Map[Int, Int],
                   remote: Map[(Int, Int), Int] = Map.empty): QueryIterStat =
    QueryIterStat(qid, iter, act, remote, localMsgs = 0)

  test("single local query: compute plus local barrier per iteration") {
    val stats = Vector(stat(0, 0, Map(0 -> 2)), stat(0, 1, Map(0 -> 3)))
    val r = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.Hybrid, c)
    assert(math.abs(r.latency(0) - (2 + 0.25 + 3 + 0.25)) < 1e-9)
    assert(math.abs(r.makespan - r.latency(0)) < 1e-9)
  }

  test("split iteration: parallel compute, comm cost, limited barrier") {
    val stats = Vector(stat(0, 0, Map(0 -> 2, 1 -> 1), Map((0, 1) -> 3)))
    val r = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.Hybrid, c)
    // compute max(2,1)=2; comm 0.5 + 3*0.1 = 0.8; barrier 2 + 2*1 = 4
    assert(math.abs(r.latency(0) - 6.8) < 1e-9)
  }

  test("per-query-global pays the full k-worker barrier even for local queries") {
    val stats = Vector(stat(0, 0, Map(0 -> 2)))
    val hybrid = LatencySimulator.simulateBatch(stats, k = 8, BarrierMode.Hybrid, c)
    val global = LatencySimulator.simulateBatch(stats, k = 8, BarrierMode.PerQueryGlobal, c)
    assert(math.abs(hybrid.latency(0) - (2 + 0.25)) < 1e-9)
    assert(math.abs(global.latency(0) - (2 + 2.0 + 8.0)) < 1e-9)
  }

  test("processor sharing: two queries on one worker split its capacity") {
    val stats = Vector(
      stat(0, 0, Map(0 -> 2)),
      stat(1, 0, Map(0 -> 1)))
    val r = LatencySimulator.simulateBatch(stats, k = 1, BarrierMode.Hybrid, c)
    assert(math.abs(r.latency(1) - (2 + 0.25)) < 1e-9) // 1 unit at rate 1/2
    assert(math.abs(r.latency(0) - (3 + 0.25)) < 1e-9) // rest at full rate
  }

  test("independent workers run queries in parallel without interference") {
    val stats = Vector(
      stat(0, 0, Map(0 -> 5)),
      stat(1, 0, Map(1 -> 5)))
    val r = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.Hybrid, c)
    assert(math.abs(r.latency(0) - 5.25) < 1e-9)
    assert(math.abs(r.latency(1) - 5.25) < 1e-9)
  }

  test("shared-global lockstep couples a fast query to a slow one") {
    val stats = Vector(
      stat(0, 0, Map(0 -> 1)), stat(0, 1, Map(0 -> 1)),
      stat(1, 0, Map(1 -> 1)))
    val shared = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.SharedGlobal, c)
    val hybrid = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.Hybrid, c)
    // Round: ps 1 + barrier (2 + 2) = 5 per round.
    assert(math.abs(shared.latency(1) - 5.0) < 1e-9)
    assert(math.abs(shared.latency(0) - 10.0) < 1e-9)
    assert(hybrid.latency(1) < shared.latency(1))
    assert(hybrid.latency(0) < shared.latency(0))
  }

  test("hybrid never exceeds per-query-global latency") {
    val stats = Vector(
      stat(0, 0, Map(0 -> 3)), stat(0, 1, Map(0 -> 2, 1 -> 1), Map((0, 1) -> 2)),
      stat(1, 0, Map(2 -> 4)), stat(1, 1, Map(2 -> 1)))
    for (k <- Seq(4, 8, 16)) {
      val h = LatencySimulator.simulateBatch(stats, k, BarrierMode.Hybrid, c)
      val g = LatencySimulator.simulateBatch(stats, k, BarrierMode.PerQueryGlobal, c)
      h.latency.foreach { case (q, l) => assert(l <= g.latency(q) + 1e-9, s"k=$k q=$q") }
    }
  }

  test("latency grows with remote message volume") {
    def withMsgs(n: Int) = LatencySimulator.simulateBatch(
      Vector(stat(0, 0, Map(0 -> 1, 1 -> 1), Map((0, 1) -> n))), 2, BarrierMode.Hybrid, c)
    assert(withMsgs(10).latency(0) < withMsgs(100).latency(0))
  }

  test("makespan equals the slowest query in decoupled mode") {
    val stats = Vector(
      stat(0, 0, Map(0 -> 1)),
      stat(1, 0, Map(1 -> 7)))
    val r = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.Hybrid, c)
    assert(math.abs(r.makespan - r.latency.values.max) < 1e-9)
  }

  test("sum and average latency helpers") {
    val r = BatchSim(Map(0 -> 2.0, 1 -> 4.0), 4.0)
    assert(r.sumLatency === 6.0)
    assert(r.avgLatency === 3.0)
  }

  test("empty stats simulate to an empty batch") {
    val r = LatencySimulator.simulateBatch(Vector.empty, 2, BarrierMode.Hybrid, c)
    assert(r.latency.isEmpty && r.makespan === 0.0)
  }

  test("contention: co-located queries are slower than spread queries") {
    val colocated = Vector(stat(0, 0, Map(0 -> 4)), stat(1, 0, Map(0 -> 4)))
    val spread = Vector(stat(0, 0, Map(0 -> 4)), stat(1, 0, Map(1 -> 4)))
    val rc = LatencySimulator.simulateBatch(colocated, 2, BarrierMode.Hybrid, c)
    val rs = LatencySimulator.simulateBatch(spread, 2, BarrierMode.Hybrid, c)
    assert(rc.sumLatency > rs.sumLatency,
      s"colocated ${rc.sumLatency} should exceed spread ${rs.sumLatency}")
  }

  test("fixed per-iteration worker cost: every involved worker pays it once") {
    val cf = c.copy(tIterWorker = 10.0)
    // One iteration, 1 active vertex on w0, messages to w1: both workers
    // are involved; they work in parallel -> compute = max(10+1, 10+0) = 11.
    val stats = Vector(stat(0, 0, Map(0 -> 1), Map((0, 1) -> 1)))
    val r = LatencySimulator.simulateBatch(stats, k = 2, BarrierMode.Hybrid, cf)
    val comm = 0.5 + 0.1
    val barrier = 2.0 + 2 * 1.0
    assert(math.abs(r.latency(0) - (11.0 + comm + barrier)) < 1e-9)
  }

  test("fixed cost makes a split query consume more system capacity than a local one") {
    val cf = c.copy(tIterWorker = 10.0, tVertex = 0.001)
    // Two co-located queries, each local: PS on one worker -> ~2x10.
    val local = Vector(stat(0, 0, Map(0 -> 1)), stat(1, 0, Map(0 -> 1)))
    // Two queries each split across both workers: every worker pays the
    // fixed cost twice -> also ~2x10 on the critical path, but now BOTH
    // workers are saturated (the split wastes a worker's capacity).
    val split = Vector(
      stat(0, 0, Map(0 -> 1, 1 -> 1)),
      stat(1, 0, Map(0 -> 1, 1 -> 1)))
    val rl = LatencySimulator.simulateBatch(local, 2, BarrierMode.Hybrid, cf)
    val rs = LatencySimulator.simulateBatch(split, 2, BarrierMode.Hybrid, cf)
    // The split queries are strictly slower: same shared compute plus
    // comm-free? no — they pay the wider barrier; and a third worker-local
    // query would find worker 1 busy. Here we check the barrier-inclusive
    // ordering only.
    assert(rs.latency(0) > rl.latency(0))
  }

  test("a localized single-worker query beats the same query split across workers") {
    // Same compute volume; the split version pays comm + a wider barrier.
    val local = Vector(stat(0, 0, Map(0 -> 8)), stat(0, 1, Map(0 -> 8)))
    val split = Vector(
      stat(0, 0, Map(0 -> 4, 1 -> 4), Map((0, 1) -> 4, (1, 0) -> 4)),
      stat(0, 1, Map(0 -> 4, 1 -> 4), Map((0, 1) -> 4, (1, 0) -> 4)))
    val rl = LatencySimulator.simulateBatch(local, 2, BarrierMode.Hybrid, c)
    val rsp = LatencySimulator.simulateBatch(split, 2, BarrierMode.Hybrid, c)
    // local: (8 + 0.25) * 2 = 16.5; split: (4 + 1.8 + 4) * 2 = 19.6
    assert(rl.latency(0) < rsp.latency(0))
  }
}
