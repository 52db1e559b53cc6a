package repro.graph

import scala.collection.mutable

/** Driver-side Dijkstra — the independent gold reference used by tests to
  * validate the distributed vertex-centric engine (and, on tiny graphs,
  * cross-checked itself against a DuckDB recursive-CTE oracle).
  */
object Dijkstra {

  /** Shortest distances from `start` to every vertex with distance strictly
    * below `bound` (plus any vertex whose final distance equals the best
    * distance found at the moment it is settled). `bound = Inf` settles the
    * whole reachable component.
    */
  def distances(
      adj: Array[Array[(Int, Double)]],
      start: Int,
      bound: Double = Double.PositiveInfinity): mutable.HashMap[Int, Double] = {
    val dist = mutable.HashMap.empty[Int, Double]
    val settled = mutable.HashSet.empty[Int]
    val pq = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by[(Double, Int), Double](_._1).reverse)
    dist(start) = 0.0
    pq.enqueue((0.0, start))
    while (pq.nonEmpty) {
      val (d, v) = pq.dequeue()
      if (!settled.contains(v) && d <= bound) {
        settled += v
        for ((u, w) <- adj(v)) {
          val nd = d + w
          if (nd < dist.getOrElse(u, Double.PositiveInfinity) && nd <= bound) {
            dist(u) = nd
            pq.enqueue((nd, u))
          }
        }
      }
    }
    dist.filterInPlace((v, _) => settled.contains(v))
    dist
  }

  /** Shortest-path distance start -> end, or None if unreachable. */
  def shortestPath(adj: Array[Array[(Int, Double)]], start: Int, end: Int): Option[Double] = {
    val dist = mutable.HashMap.empty[Int, Double]
    val settled = mutable.HashSet.empty[Int]
    val pq = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by[(Double, Int), Double](_._1).reverse)
    dist(start) = 0.0
    pq.enqueue((0.0, start))
    while (pq.nonEmpty) {
      val (d, v) = pq.dequeue()
      if (v == end) return Some(d)
      if (!settled.contains(v)) {
        settled += v
        for ((u, w) <- adj(v)) {
          val nd = d + w
          if (nd < dist.getOrElse(u, Double.PositiveInfinity)) {
            dist(u) = nd
            pq.enqueue((nd, u))
          }
        }
      }
    }
    None
  }

  /** Nearest vertex satisfying `tagged` (the POI query): returns
    * `(vid, distance)` of the closest tagged vertex, ties broken by the
    * smaller vertex id (matching the engine's deterministic tie-break).
    */
  def nearestTagged(
      adj: Array[Array[(Int, Double)]],
      start: Int,
      tagged: Int => Boolean): Option[(Int, Double)] = {
    val dist = mutable.HashMap.empty[Int, Double]
    val settled = mutable.HashSet.empty[Int]
    val pq = mutable.PriorityQueue.empty[(Double, Int)](
      Ordering.by[(Double, Int), (Double, Int)](t => (t._1, t._2)).reverse)
    dist(start) = 0.0
    pq.enqueue((0.0, start))
    while (pq.nonEmpty) {
      val (d, v) = pq.dequeue()
      if (tagged(v)) return Some((v, d))
      if (!settled.contains(v)) {
        settled += v
        for ((u, w) <- adj(v)) {
          val nd = d + w
          if (nd < dist.getOrElse(u, Double.PositiveInfinity)) {
            dist(u) = nd
            pq.enqueue((nd, u))
          }
        }
      }
    }
    None
  }
}
