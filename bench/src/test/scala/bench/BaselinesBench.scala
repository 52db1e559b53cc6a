package bench

import repro.SparkSpec
import repro.exp.{Experiments, Reports}

/** The two baseline remarks of Section 4.1:
  *   - LDG [36] was excluded because the skewed query workload left it
  *     "highly imbalanced", increasing average query latency by 2-6x;
  *   - GraphX-style query-agnostic full-graph execution was more than three
  *     orders of magnitude slower for the same problem instance.
  */
class BaselinesBench extends SparkSpec {

  private lazy val ldg = Experiments.ldgComparison(BenchData.spark, BenchData.bw)
  private lazy val full = Experiments.fullGraphBaseline(BenchData.spark, BenchData.bw, nQueries = 4)

  test("report: LDG exclusion") {
    println(Reports.ldg(ldg))
  }

  test("report: full-graph baseline") {
    println(Reports.fullGraph(full))
  }

  test("LDG is heavily query-imbalanced vs Hash (the paper's exclusion reason)") {
    // Paper: "LDG resulted in highly imbalanced partitions due to the
    // skewness of the query distribution". Our LDG reproduces that: its
    // partitions are vertex-count balanced (capacity bound) but the hotspot
    // query load deviates many times more than under Hash.
    assert(ldg.ldgImbalance > 5 * ldg.hashImbalance,
      f"LDG ${ldg.ldgImbalance}%.2f vs Hash ${ldg.hashImbalance}%.2f")
  }

  test("LDG behaves as an (imbalanced) locality partitioner on the grid") {
    // The paper additionally reports a 2-6x latency blow-up vs its methods
    // on OSM data. On our uniform grid LDG's row-major stream yields
    // contiguous bands — near-Domain locality — so the latency factor does
    // not reproduce (documented in EXPERIMENTS.md); we pin the measured
    // behaviour instead: faster than Hash, imbalanced like Domain.
    assert(ldg.slowdown < 1.0, f"${ldg.slowdown}%.2fx vs Hash")
    assert(ldg.ldgImbalance > 0.3, f"query imbalance ${ldg.ldgImbalance}%.2f")
  }

  test("full-graph execution activates orders of magnitude more vertices") {
    assert(full.activationRatio > 50.0, f"${full.activationRatio}%.1fx")
  }

  test("full-graph execution is far slower in simulated latency") {
    assert(full.latencyRatio > 10.0, f"${full.latencyRatio}%.1fx")
  }
}
