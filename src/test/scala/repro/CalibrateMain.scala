package repro

import repro.core._
import repro.exp._
import repro.partition._
import repro.sim.CostModel
import repro.sync.BarrierMode

/** Calibration sweep: replays the cached BW traces under candidate cost
  * models and prints the figure-shape diagnostics the paper pins down
  * (Fig 7 U-shape position, LDG slowdown, Fig 6d ratios, Fig 6a
  * reductions). Traces are loaded from `target/traces/`, so iterations are
  * cheap. Run with `sbt "Test/runMain repro.CalibrateMain"`.
  */
object CalibrateMain {
  def main(args: Array[String]): Unit = {
    val spark = SparkSpec.shared
    val s = ExpScale.bw
    val traces = Traces.sssp(spark, s)
    val g = s.network

    val candidates = Seq(
      "default (tw=2.5 fl=1.0)" -> CostModel(),
    )

    for ((name, cm) <- candidates) {
      val ctrl = Experiments.controllerConfig()
      def static(assign: Array[Int], k: Int) =
        QGraphRunner.run(assign, traces, RunConfig("s", k, BarrierMode.Hybrid, adaptive = false, cm, ctrl))
      def adaptive(assign: Array[Int], k: Int) =
        QGraphRunner.run(assign, traces, RunConfig("a", k, BarrierMode.Hybrid, adaptive = true, cm, ctrl))

      val ks = Seq(2, 4, 8, 16)
      val hashSeries = ks.map(k => static(HashPartitioner.assign(g, k), k).totalLatency)
      val domSeries = ks.map(k => static(DomainPartitioner.assign(g, k), k).totalLatency)
      val hash8 = hashSeries(2)
      val qcut8 = adaptive(HashPartitioner.assign(g, 8), 8).totalLatency
      val dom8 = domSeries(2)
      val dqcut8 = adaptive(DomainPartitioner.assign(g, 8), 8).totalLatency
      val ldg8 = static(LdgPartitioner.assign(g, 8), 8).totalLatency
      val bspHash = QGraphRunner.run(HashPartitioner.assign(g, 8), traces.take(4),
        RunConfig("b", 8, BarrierMode.SharedGlobal, adaptive = false, cm, ctrl)).totalLatency
      val hybHash = QGraphRunner.run(HashPartitioner.assign(g, 8), traces.take(4),
        RunConfig("h", 8, BarrierMode.Hybrid, adaptive = false, cm, ctrl)).totalLatency
      val bspDom = QGraphRunner.run(DomainPartitioner.assign(g, 8), traces.take(4),
        RunConfig("b", 8, BarrierMode.SharedGlobal, adaptive = false, cm, ctrl)).totalLatency
      val hybDom = QGraphRunner.run(DomainPartitioner.assign(g, 8), traces.take(4),
        RunConfig("h", 8, BarrierMode.Hybrid, adaptive = false, cm, ctrl)).totalLatency

      println(f"--- $name")
      println("  hash k=2,4,8,16:   " + hashSeries.map(v => f"$v%8.2f").mkString +
        f"   (want min at k=8, k16 worse)")
      println("  domain k=2,4,8,16: " + domSeries.map(v => f"$v%8.2f").mkString +
        f"   (want monotone decreasing; k2 > hash k2)")
      println(f"  qcut/hash @8: ${1 - qcut8 / hash8}%5.2f (paper .43)  dqcut/dom @8: ${1 - dqcut8 / dom8}%5.2f (paper .22)")
      println(f"  ldg slowdown vs hash @8: ${ldg8 / hash8}%5.2f (paper 2-6 vs methods)")
      println(f"  hybrid speedup hash ${bspHash / hybHash}%5.2f dom ${bspDom / hybDom}%5.2f (paper 1.2-1.7)  dom/hash hyb ${hybHash / hybDom}%5.2f (paper 1.7-2.4)")
    }

    // Domain-adaptive deep dive under the default model: why does / doesn't
    // Q-cut improve on Domain at k=8?
    val cm = CostModel()
    val ctrl = Experiments.controllerConfig()
    val k = 8
    val domStatic = QGraphRunner.run(DomainPartitioner.assign(g, k), traces,
      RunConfig("Domain", k, BarrierMode.Hybrid, adaptive = false, cm, ctrl))
    val domAdapt = QGraphRunner.run(DomainPartitioner.assign(g, k), traces,
      RunConfig("Domain+Q-cut", k, BarrierMode.Hybrid, adaptive = true, cm, ctrl))
    println("--- Domain adaptive deep dive (k=8)")
    println("  batch:      " + domStatic.batches.indices.map(i => f"$i%6d").mkString)
    println("  stat avgLat " + domStatic.batches.map(b => f"${b.avgLatency * 1000}%6.1f").mkString)
    println("  adap avgLat " + domAdapt.batches.map(b => f"${b.avgLatency * 1000}%6.1f").mkString)
    println("  stat imbal  " + domStatic.batches.map(b => f"${b.imbalance}%6.2f").mkString)
    println("  adap imbal  " + domAdapt.batches.map(b => f"${b.imbalance}%6.2f").mkString)
    println("  stat local  " + domStatic.batches.map(b => f"${b.locality}%6.2f").mkString)
    println("  adap local  " + domAdapt.batches.map(b => f"${b.locality}%6.2f").mkString)
    println("  adap moved  " + domAdapt.batches.map(b => f"${b.movedVertices}%6d").mkString)
    println(f"  totals: static ${domStatic.totalLatency}%8.2f adaptive ${domAdapt.totalLatency}%8.2f")
    spark.stop()
  }
}
