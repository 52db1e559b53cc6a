package repro.workload

import org.scalatest.funsuite.AnyFunSuite
import repro.TestFixtures
import repro.engine.QueryKind

class QueryWorkloadSpec extends AnyFunSuite {
  private val g = TestFixtures.small

  test("apportionment distributes exactly n queries") {
    for (n <- Seq(1, 7, 16, 100)) {
      assert(QueryWorkload.apportion(g, n).sum === n)
    }
  }

  test("apportionment is population-proportional (skewed towards city 0)") {
    val counts = QueryWorkload.apportion(g, 1000)
    assert(counts(0) === counts.max, "largest city must receive the most queries")
    val expected = g.cities.map(_.popShare * 1000)
    counts.zip(expected).foreach { case (c, e) =>
      assert(math.abs(c - e) <= 1.0, s"largest-remainder apportionment off: $c vs $e")
    }
  }

  test("generate produces n queries with unique consecutive qids") {
    val qs = QueryWorkload.generate(g, 48, QueryKind.Sssp, seed = 1)
    assert(qs.size === 48)
    assert(qs.map(_.qid).sorted === (0 until 48).toVector)
  }

  test("qidOffset and batchOffset shift ids (disturbance phase appending)") {
    val qs = QueryWorkload.generate(g, 16, QueryKind.Sssp, seed = 2, qidOffset = 100, batchOffset = 7)
    assert(qs.map(_.qid).sorted === (100 until 116).toVector)
    assert(qs.map(_.batch).distinct === Vector(7))
  }

  test("batches have batchSize queries (last possibly smaller)") {
    val qs = QueryWorkload.generate(g, 42, QueryKind.Sssp, batchSize = 16, seed = 3)
    val sizes = qs.groupBy(_.batch).toSeq.sortBy(_._1).map(_._2.size)
    assert(sizes === Seq(16, 16, 10))
  }

  test("start vertices lie within the city radius of their hotspot") {
    val r = QueryWorkload.cityRadius(g)
    val qs = QueryWorkload.generate(g, 64, QueryKind.Sssp, seed = 4)
    qs.foreach { q =>
      val c = g.cities(q.city)
      val d = math.hypot((g.xOf(q.start) - c.cx).toDouble, (g.yOf(q.start) - c.cy).toDouble)
      assert(d <= r + 1e-9, s"query ${q.qid} starts outside its hotspot")
    }
  }

  test("intra-urban SSSP ends near the same city, min separation enforced") {
    val r = QueryWorkload.cityRadius(g)
    val qs = QueryWorkload.generate(g, 64, QueryKind.Sssp, seed = 5)
    qs.foreach { q =>
      val c = g.cities(q.city)
      val d = math.hypot((g.xOf(q.end) - c.cx).toDouble, (g.yOf(q.end) - c.cy).toDouble)
      assert(d <= r + 1e-9, s"query ${q.qid} ends outside its hotspot")
      assert(q.start !== q.end)
    }
  }

  test("inter-urban SSSP ends near a neighbouring city (the Fig 5a disturbance)") {
    val r = QueryWorkload.cityRadius(g)
    val qs = QueryWorkload.generate(g, 64, QueryKind.Sssp, interUrban = true, seed = 6)
    val anyDifferent = qs.exists { q =>
      val c = g.cities(q.city)
      math.hypot((g.xOf(q.end) - c.cx).toDouble, (g.yOf(q.end) - c.cy).toDouble) > r
    }
    assert(anyDifferent, "inter-urban ends should leave the start hotspot")
    qs.foreach { q =>
      val near = QueryWorkload.neighborCities(g, q.city).exists { o =>
        val oc = g.cities(o)
        math.hypot((g.xOf(q.end) - oc.cx).toDouble, (g.yOf(q.end) - oc.cy).toDouble) <= r + 1e-9
      }
      assert(near, s"query ${q.qid} end is near no neighbour city")
    }
  }

  test("POI queries have no end vertex") {
    val qs = QueryWorkload.generate(g, 16, QueryKind.Poi, seed = 7)
    assert(qs.forall(_.end === -1))
    assert(qs.forall(_.kind === QueryKind.Poi))
  }

  test("generation is deterministic in the seed") {
    val a = QueryWorkload.generate(g, 32, QueryKind.Sssp, seed = 9)
    val b = QueryWorkload.generate(g, 32, QueryKind.Sssp, seed = 9)
    assert(a === b)
    val c = QueryWorkload.generate(g, 32, QueryKind.Sssp, seed = 10)
    assert(a !== c)
  }

  test("neighborCities returns the 3 closest other cities") {
    val n = QueryWorkload.neighborCities(g, 0)
    assert(n.size === 3)
    assert(!n.contains(0))
    // They must be sorted by distance.
    val dists = n.map { o =>
      val a = g.cities(0); val b = g.cities(o)
      math.hypot((a.cx - b.cx).toDouble, (a.cy - b.cy).toDouble)
    }
    assert(dists === dists.sorted)
  }

  test("cityRadius scales with the grid") {
    assert(QueryWorkload.cityRadius(repro.graph.RoadNetwork.bwLite) >
      QueryWorkload.cityRadius(TestFixtures.tiny))
  }
}
