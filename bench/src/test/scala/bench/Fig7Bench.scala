package bench

import repro.SparkSpec
import repro.exp.{Experiments, Reports}

/** Fig. 7: scale-out behaviour — total latency for k = 2..16 workers under
  * the four strategies, SSSP and POI on BW.
  * Paper (SSSP): Hash improves 927 -> 474 s from k=2 to 8, then *worsens*
  * to 863 s at k=16 (communication overhead); Hash+Q-cut reaches 283 s at
  * k=8. Domain scales monotonically 1790 -> 562 s (2 -> 16), Domain+Q-cut
  * 1150 -> 301 s; Domain's k=2 latency is high due to stragglers.
  */
class Fig7Bench extends SparkSpec {

  private val ks = Seq(2, 4, 8, 16)
  private lazy val sssp = Experiments.scalability(BenchData.spark, BenchData.bw, ks)
  private lazy val poi = Experiments.scalability(BenchData.spark, BenchData.bw, ks, poi = true)

  test("report: Fig 7 (SSSP)") {
    println(Reports.scalability(sssp, ks, "SSSP"))
  }

  test("report: Fig 7 (POI)") {
    println(Reports.scalability(poi, ks, "POI"))
  }

  test("Hash stops scaling: k=16 is no better than k=8 (communication overhead)") {
    val s = sssp.series("Hash", ks)
    assert(s(2) < s(0), "k=8 must beat k=2")
    assert(s(3) > s(2) * 0.95, s"k=16 (${s(3)}) should not improve on k=8 (${s(2)})")
  }

  test("Q-cut on Hash beats static Hash at k=8 (paper: 474 -> 283 s)") {
    assert(sssp.totals(("Hash+Q-cut", 8)) < sssp.totals(("Hash", 8)))
  }

  test("Domain scales monotonically from k=2 to k=16 (paper: 1790 -> 562 s)") {
    val s = sssp.series("Domain", ks)
    assert(s.last < s.head, s.toString)
  }

  test("Domain suffers stragglers at low k: its k=2/k=16 ratio matches the paper's ~3.2x") {
    // Paper: Domain 1790 s at k=2 vs 562 s at k=16 — a 3.2x straggler
    // penalty at low worker counts. (The paper additionally has Domain k=2
    // above Hash k=2; at our scale a query frontier spans only a few
    // vertices, so Hash cannot parallelise within an iteration while still
    // paying every worker's per-iteration overhead, and that cross-system
    // ordering inverts — see EXPERIMENTS.md.)
    val ratio = sssp.totals(("Domain", 2)) / sssp.totals(("Domain", 16))
    assert(ratio > 2.0, f"Domain k2/k16 ratio $ratio%.2f (paper 3.2x)")
  }

  test("Q-cut improves Domain scaling (paper: 1150 -> 301 s)") {
    val s = sssp.series("Domain+Q-cut", ks)
    assert(s.last < s.head, s.toString)
    assert(sssp.totals(("Domain+Q-cut", 16)) <= sssp.totals(("Domain", 16)) * 1.05)
  }

  test("similar results for POI (paper: 'Similar results were obtained for POI')") {
    assert(poi.totals(("Hash+Q-cut", 8)) < poi.totals(("Hash", 8)))
    assert(poi.series("Domain", ks).last < poi.series("Domain", ks).head)
  }
}
