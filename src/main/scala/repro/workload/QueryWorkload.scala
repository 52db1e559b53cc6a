package repro.workload

import repro.engine.{Query, QueryKind}
import repro.graph.RoadNetwork
import scala.collection.mutable
import scala.util.Random

/** Hotspot query generator (Section 4.1 of the paper).
  *
  * The paper determines the biggest cities of the road network and generates
  * per-query random start vertices around those hotspots, keeping the number
  * of queries per city proportional to city population; SSSP end vertices
  * have variable distance to cover intra- and inter-urban mapping queries.
  * This generator reproduces that process on the synthetic network:
  *
  *   - per-city query counts: largest-remainder apportionment of the Zipf
  *     population shares (deterministic, skewed — the "Berlin" effect);
  *   - start vertices: uniform in a disc of radius `cityRadius` around the
  *     city centre;
  *   - intra-urban SSSP: end vertex in the same disc, at least
  *     `cityRadius / 2` away (Manhattan) from the start;
  *   - inter-urban SSSP (the Fig. 5a disturbance): end vertex around one of
  *     the 3 nearest *neighbouring* cities;
  *   - POI: start vertex only.
  *
  * Queries are shuffled deterministically and packed into batches of
  * `batchSize` (16 in all paper experiments) in arrival order.
  */
object QueryWorkload {

  /** Disc radius queries are drawn from. Layout-aware: a fraction of the
    * minimal city separation, so query scopes stay well inside their
    * hotspot's Voronoi region (the paper's Domain partitioning reaches ~98%
    * locality, which requires scopes to rarely cross region borders).
    */
  def cityRadius(g: RoadNetwork): Int = {
    if (g.cities.size < 2) return math.max(2, g.side / 6)
    var minSep = Double.MaxValue
    for (a <- g.cities; b <- g.cities if a.id < b.id) {
      val d = math.hypot((a.cx - b.cx).toDouble, (a.cy - b.cy).toDouble)
      if (d < minSep) minSep = d
    }
    math.max(2, (0.35 * minSep).toInt)
  }

  /** Apportions `n` queries to cities proportionally to population
    * (largest-remainder method; deterministic).
    */
  def apportion(g: RoadNetwork, n: Int): IndexedSeq[Int] = {
    val exact = g.cities.map(_.popShare * n)
    val floors = exact.map(_.toInt).toArray
    var left = n - floors.sum
    val byRemainder = exact.zipWithIndex.sortBy { case (e, _) => -(e - e.toInt) }
    var i = 0
    while (left > 0 && i < byRemainder.length) {
      floors(byRemainder(i)._2) += 1
      left -= 1
      i = (i + 1) % byRemainder.length
    }
    floors.toIndexedSeq
  }

  /** Draws a vertex uniformly from the disc of radius `r` around `(cx, cy)`,
    * clipped to the grid.
    */
  private def vertexNear(g: RoadNetwork, cx: Int, cy: Int, r: Int, rng: Random): Int = {
    var x = 0; var y = 0; var ok = false
    while (!ok) {
      val dx = rng.nextInt(2 * r + 1) - r
      val dy = rng.nextInt(2 * r + 1) - r
      if (dx * dx + dy * dy <= r * r) {
        x = cx + dx; y = cy + dy
        ok = x >= 0 && x < g.side && y >= 0 && y < g.side
      }
    }
    g.vidOf(x, y)
  }

  /** The 3 nearest other cities of `city` (euclidean, by centre). */
  def neighborCities(g: RoadNetwork, city: Int): IndexedSeq[Int] = {
    val c = g.cities(city)
    g.cities.filter(_.id != city)
      .sortBy(o => { val dx = (o.cx - c.cx).toDouble; val dy = (o.cy - c.cy).toDouble; dx * dx + dy * dy })
      .take(3).map(_.id)
  }

  /** Generates `n` hotspot queries.
    *
    * @param kind       SSSP or POI
    * @param interUrban if true, SSSP end vertices lie near a neighbouring
    *                   city (the workload disturbance of Fig. 5a); ignored
    *                   for POI
    * @param qidOffset  first qid (use to append a disturbance phase with
    *                   globally unique ids)
    * @param batchOffset first batch index
    */
  def generate(
      g: RoadNetwork,
      n: Int,
      kind: QueryKind,
      batchSize: Int = 16,
      interUrban: Boolean = false,
      seed: Long = 1,
      qidOffset: Int = 0,
      batchOffset: Int = 0): Vector[Query] = {
    require(n > 0 && batchSize > 0)
    val rng = new Random(seed)
    val r = cityRadius(g)
    val counts = apportion(g, n)
    val raw = mutable.ArrayBuffer.empty[(Int, Int, Int)] // (city, start, end)
    for (city <- g.cities.indices; _ <- 0 until counts(city)) {
      val c = g.cities(city)
      val start = vertexNear(g, c.cx, c.cy, r, rng)
      val end = kind match {
        case QueryKind.Poi => -1
        case QueryKind.Sssp =>
          if (interUrban) {
            val cands = neighborCities(g, city)
            val other = g.cities(cands(rng.nextInt(cands.length)))
            vertexNear(g, other.cx, other.cy, r, rng)
          } else {
            var e = vertexNear(g, c.cx, c.cy, r, rng)
            var tries = 0
            while ((e == start ||
              math.abs(g.xOf(e) - g.xOf(start)) + math.abs(g.yOf(e) - g.yOf(start)) < r / 2) && tries < 1000) {
              e = vertexNear(g, c.cx, c.cy, r, rng)
              tries += 1
            }
            e
          }
      }
      raw += ((city, start, end))
    }
    // Arrival order: random interleaving of the per-city streams.
    val shuffled = rng.shuffle(raw.toVector)
    shuffled.zipWithIndex.map { case ((city, start, end), i) =>
      Query(qidOffset + i, kind, start, end, city, batchOffset + i / batchSize)
    }
  }
}
