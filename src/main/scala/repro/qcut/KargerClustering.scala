package repro.qcut

import scala.util.Random

/** Query clustering preprocessing of Appendix A.1: "we clustered the queries
  * as a preprocessing step into 4k clusters using a variant of the
  * well-known Karger's algorithm [...] and moved whole clusters between
  * workers."
  *
  * We build the query overlap graph (edge weight = number of shared scope
  * vertices, from the atoms' intersection structure) and contract randomly
  * chosen edges, probability proportional to weight — Karger's contraction —
  * until at most `target` components remain or no overlap edge connects two
  * components. Heavily overlapping queries therefore end up in one cluster
  * and are moved together.
  */
object KargerClustering {

  /** Pairwise overlap weights derived from atoms: for every atom, each query
    * pair in its signature shares the atom's vertices.
    */
  def overlapsFromAtoms(atoms: Seq[Atom]): Map[(Int, Int), Long] = {
    val acc = scala.collection.mutable.HashMap.empty[(Int, Int), Long]
    for (a <- atoms; i <- a.sig.indices; j <- (i + 1) until a.sig.length) {
      val key = (a.sig(i), a.sig(j))
      acc(key) = acc.getOrElse(key, 0L) + a.size
    }
    acc.toMap
  }

  /** Contracts the overlap graph on `queryIds` down to <= `target` clusters.
    * Returns cluster ids (0-based, compact) aligned with `queryIds`.
    */
  def cluster(
      queryIds: IndexedSeq[Int],
      overlaps: Map[(Int, Int), Long],
      target: Int,
      rng: Random): Array[Int] = {
    require(target >= 1)
    val n = queryIds.length
    val index = queryIds.zipWithIndex.toMap
    val parent = Array.tabulate(n)(i => i)
    def find(x: Int): Int = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != c) {
        val next = parent(c)
        parent(c) = r
        c = next
      }
      r
    }
    val edges = overlaps.toVector.collect {
      case ((a, b), w) if index.contains(a) && index.contains(b) && w > 0 =>
        (index(a), index(b), w)
    }.sortBy(e => (e._1, e._2)) // deterministic base order before seeded draws
    var components = n
    var live = edges
    while (components > target && live.nonEmpty) {
      val total = live.iterator.map(_._3).sum
      var draw = (rng.nextDouble() * total).toLong
      var pick = live.head
      var i = 0
      while (i < live.length && draw >= live(i)._3) { draw -= live(i)._3; i += 1 }
      if (i < live.length) pick = live(i)
      val ra = find(pick._1); val rb = find(pick._2)
      if (ra != rb) { parent(rb) = ra; components -= 1 }
      live = live.filter(e => find(e._1) != find(e._2))
    }
    // Compact component roots to 0..C-1.
    val rootIds = scala.collection.mutable.LinkedHashMap.empty[Int, Int]
    Array.tabulate(n) { q =>
      val r = find(q)
      rootIds.getOrElseUpdate(r, rootIds.size)
    }
  }

  /** Identity clustering (used when the window holds <= target queries, and
    * by tests that need cluster == query).
    */
  def identityClusters(nQueries: Int): Array[Int] = Array.tabulate(nQueries)(i => i)
}
