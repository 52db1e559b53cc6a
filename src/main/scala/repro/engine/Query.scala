package repro.engine

/** The two vertex-centric query types evaluated in the paper (Section 4.1). */
sealed trait QueryKind
object QueryKind {
  /** Single-source shortest path between a given start and end vertex. */
  case object Sssp extends QueryKind
  /** Point-of-interest: nearest vertex carrying the POI tag. */
  case object Poi extends QueryKind
}

/** A graph analytics query `q = (f, V_sub)` (Section 2): the vertex function
  * is selected by `kind`; the initial active set is `{start}`.
  *
  * @param qid   globally unique query id
  * @param kind  SSSP or POI
  * @param start start vertex (the single member of V_sub)
  * @param end   end vertex for SSSP; -1 for POI
  * @param city  hotspot city the query was generated around (workload metadata)
  * @param batch index of the 16-query batch this query is scheduled in
  */
final case class Query(qid: Int, kind: QueryKind, start: Int, end: Int, city: Int, batch: Int) {
  require(kind != QueryKind.Sssp || end >= 0, s"SSSP query $qid needs an end vertex")
}
