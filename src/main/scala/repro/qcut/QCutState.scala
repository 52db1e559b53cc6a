package repro.qcut

import scala.collection.mutable

/** A mutable ILS solution state over scope atoms.
  *
  * The state tracks, per worker: the vertex count |V(w)|, the summed local
  * scope sizes Σ_q |LS(q,w)|, and hence the paper's workload
  * `L_w = (|V(w)| + Σ_q |LS(q,w)|) / 2` (Appendix A.1). The cost function is
  * the query-cut cost of Section 3.2.2:
  * `Σ_q Σ_{w != argmax_w' |LS(q,w')|} |LS(q,w)|`.
  *
  * Moves operate on *query clusters* (Appendix A.1: queries are
  * pre-clustered with a Karger-style algorithm into 4k clusters and whole
  * clusters are moved between workers): `moveCluster(c, from, to)` relocates
  * every atom on `from` whose signature intersects cluster `c` — this is the
  * API-level `move(LS(q,w), w, w')` of Table 2 lifted to clusters.
  *
  * Note on balance accounting: the paper's Algorithm 2 approximates the
  * workload change of a move by the scope size x; we compute the exact
  * change from the moved atoms (vertices and scope multiplicities), which is
  * strictly more faithful to the workload definition. The δ-threshold form
  * of the predicate is the paper's.
  */
final class QCutState private (
    val atoms: IndexedSeq[Atom],
    val queryIds: IndexedSeq[Int],
    val clusterOfQuery: Array[Int],
    val nClusters: Int,
    val k: Int,
    val delta: Double,
    val untouched: Array[Long],
    val assign: Array[Int],
    // caches, all owned by this instance:
    private val ls: Array[Array[Long]],
    private val clusterMass: Array[Array[Long]],
    private val vCount: Array[Long],
    private val sCount: Array[Long]) {

  private val qIndex: Map[Int, Int] = queryIds.zipWithIndex.toMap
  /** Per atom: distinct clusters its signature intersects. */
  private val atomClusters: IndexedSeq[Array[Int]] =
    atoms.map(a => a.sig.map(q => clusterOfQuery(qIndex(q))).distinct.sorted.toArray)

  def nQueries: Int = queryIds.length

  /** |LS(q, w)| for query index (not qid!) `qi`. */
  def localScope(qi: Int, w: Int): Long = ls(qi)(w)

  /** Union scope size of cluster `c` on worker `w`. */
  def clusterScope(c: Int, w: Int): Long = clusterMass(c)(w)

  /** The paper's workload L_w. */
  def load(w: Int): Double = (vCount(w) + sCount(w)) / 2.0

  /** Query-cut cost of the current assignment (Section 3.2.2). */
  def cost: Long = {
    var total = 0L
    var qi = 0
    while (qi < nQueries) {
      var sum = 0L; var max = 0L; var w = 0
      while (w < k) { val x = ls(qi)(w); sum += x; if (x > max) max = x; w += 1 }
      total += sum - max
      qi += 1
    }
    total
  }

  /** Pairwise balance predicate of Appendix A.1. */
  def balancedPair(w1: Int, w2: Int): Boolean = {
    val a = load(w1); val b = load(w2)
    val m = math.max(a, b)
    m == 0 || math.abs(a - b) / m < delta
  }

  /** Global balance: all worker pairs satisfy the δ-constraint. */
  def globallyBalanced: Boolean = {
    var min = Double.MaxValue; var max = 0.0
    var w = 0
    while (w < k) { val l = load(w); if (l < min) min = l; if (l > max) max = l; w += 1 }
    max == 0 || (max - min) / max < delta
  }

  /** Atoms on `from` whose signature intersects cluster `c`. */
  def clusterAtomsOn(c: Int, from: Int): Vector[Int] =
    atoms.indices.iterator
      .filter(i => assign(i) == from && atomClusters(i).contains(c))
      .toVector

  /** Would moving `atomIdxs` from their (common) worker to `to` keep the
    * moved-pair balanced? Returns the predicate of Algorithm 2 line 15 with
    * exact workload deltas.
    */
  def moveKeepsPairBalanced(atomIdxs: Seq[Int], to: Int): Boolean = {
    if (atomIdxs.isEmpty) return true
    val from = assign(atomIdxs.head)
    var dV = 0L; var dS = 0L
    for (i <- atomIdxs) {
      require(assign(i) == from, "atoms of one move must share a worker")
      dV += atoms(i).size
      dS += atoms(i).size.toLong * atoms(i).sig.length
    }
    val newFrom = (vCount(from) - dV + sCount(from) - dS) / 2.0
    val newTo = (vCount(to) + dV + sCount(to) + dS) / 2.0
    val m = math.max(newFrom, newTo)
    m == 0 || math.abs(newFrom - newTo) / m < delta
  }

  /** Moves the given atoms (all on one worker) to `to`; returns the moved
    * indices so the caller can `moveAtoms(idxs, from)` to undo.
    */
  def moveAtoms(atomIdxs: Seq[Int], to: Int): Unit =
    for (i <- atomIdxs) {
      val from = assign(i)
      if (from != to) {
        val a = atoms(i)
        val sz = a.size.toLong
        assign(i) = to
        vCount(from) -= sz; vCount(to) += sz
        sCount(from) -= sz * a.sig.length; sCount(to) += sz * a.sig.length
        for (q <- a.sig) { val qi = qIndex(q); ls(qi)(from) -= sz; ls(qi)(to) += sz }
        for (c <- atomClusters(i)) { clusterMass(c)(from) -= sz; clusterMass(c)(to) += sz }
      }
    }

  /** `move(LS(c, from), from, to)` lifted to cluster `c`; returns the moved
    * atom indices (empty if the cluster has no scope on `from`).
    */
  def moveCluster(c: Int, from: Int, to: Int): Vector[Int] = {
    val idxs = clusterAtomsOn(c, from)
    moveAtoms(idxs, to)
    idxs
  }

  /** Deep copy (atoms are shared, caches are cloned). */
  def copyState(): QCutState =
    new QCutState(atoms, queryIds, clusterOfQuery, nClusters, k, delta, untouched,
      assign.clone(), ls.map(_.clone()), clusterMass.map(_.clone()), vCount.clone(), sCount.clone())

  /** Translates the high-level solution back to a vertex assignment
    * (step 3 of the MAPE strategy, Fig. 3): applies every atom that moved
    * relative to `base`. Returns the new assignment and the number of moved
    * vertices.
    */
  def toVertexAssignment(base: Array[Int]): (Array[Int], Long) = {
    val out = base.clone()
    var moved = 0L
    for (i <- atoms.indices if assign(i) != atoms(i).worker) {
      val w = assign(i)
      for (v <- atoms(i).vids) out(v) = w
      moved += atoms(i).size
    }
    (out, moved)
  }
}

object QCutState {

  /** Builds the initial ILS state ("as received by the workers",
    * Appendix A.3) from atoms and the per-worker total vertex counts.
    *
    * @param totalPerWorker |V(w)| under the current assignment (touched and
    *                       untouched vertices)
    * @param clusterOfQuery query-index -> cluster id (from
    *                       [[KargerClustering]]; identity for <= 4k queries)
    */
  def build(
      atoms: IndexedSeq[Atom],
      totalPerWorker: Array[Long],
      k: Int,
      delta: Double,
      clusterOfQuery: Array[Int]): QCutState = {
    val queryIds = atoms.flatMap(_.sig).distinct.sorted
    require(clusterOfQuery.length == queryIds.length,
      s"clusterOfQuery size ${clusterOfQuery.length} != ${queryIds.length} queries")
    val nClusters = if (clusterOfQuery.isEmpty) 0 else clusterOfQuery.max + 1
    val qIndex = queryIds.zipWithIndex.toMap
    val ls = Array.fill(queryIds.length)(Array.fill(k)(0L))
    val clusterMass = Array.fill(nClusters)(Array.fill(k)(0L))
    val vTouched = Array.fill(k)(0L)
    val sCount = Array.fill(k)(0L)
    val assign = atoms.map(_.worker).toArray
    for (a <- atoms) {
      val sz = a.size.toLong
      vTouched(a.worker) += sz
      sCount(a.worker) += sz * a.sig.length
      for (q <- a.sig) ls(qIndex(q))(a.worker) += sz
      for (c <- a.sig.map(q => clusterOfQuery(qIndex(q))).distinct)
        clusterMass(c)(a.worker) += sz
    }
    val untouched = Array.tabulate(k)(w => totalPerWorker(w) - vTouched(w))
    require(untouched.forall(_ >= 0L), "totalPerWorker smaller than touched vertices")
    val vCount = totalPerWorker.clone()
    new QCutState(atoms, queryIds, clusterOfQuery, nClusters, k, delta, untouched,
      assign, ls, clusterMass, vCount, sCount)
  }
}
