package repro.qcut

/** Algorithm 2 of the paper: steepest-descent local search over cluster-scope
  * moves.
  *
  * In each step every successor state — "moving any local query scope from
  * worker w to worker w'" (lifted to clusters, Appendix A.1) that keeps the
  * moved pair δ-balanced (line 15) — is evaluated; the cheapest one is taken
  * if it strictly improves the cost, otherwise the current state is a local
  * minimum and is returned.
  */
object LocalSearch {

  /** One candidate move: cluster `c` from worker `from` to worker `to`. */
  final case class Move(c: Int, from: Int, to: Int)

  /** Runs the search in place on `s` until a local minimum (or `maxSteps`,
    * or the `deadlineNanos` wall-clock deadline — the paper's ILS must
    * "provide the best found solution when interrupted", Section 3.2.2).
    * Returns the number of accepted moves.
    */
  def run(s: QCutState, maxSteps: Int = 10000, deadlineNanos: Long = Long.MaxValue): Int = {
    var steps = 0
    var improved = true
    while (improved && steps < maxSteps && System.nanoTime() < deadlineNanos) {
      improved = false
      bestSuccessor(s) match {
        case Some((move, movedCost)) if movedCost < s.cost =>
          s.moveCluster(move.c, move.from, move.to)
          improved = true
          steps += 1
        case _ => ()
      }
    }
    steps
  }

  /** Evaluates all balanced successors; returns the cheapest one and its
    * cost (even if it does not improve — the caller decides, mirroring
    * Algorithm 2 lines 5-9).
    */
  def bestSuccessor(s: QCutState): Option[(Move, Long)] = {
    var best: Option[(Move, Long)] = None
    var c = 0
    while (c < s.nClusters) {
      var from = 0
      while (from < s.k) {
        if (s.clusterScope(c, from) > 0) {
          // Atom set is identical for every destination; compute it once.
          val idxs = s.clusterAtomsOn(c, from)
          var to = 0
          while (to < s.k) {
            if (to != from && s.moveKeepsPairBalanced(idxs, to)) {
              s.moveAtoms(idxs, to)
              val cost = s.cost
              s.moveAtoms(idxs, from) // undo
              if (best.isEmpty || cost < best.get._2) best = Some((Move(c, from, to), cost))
            }
            to += 1
          }
        }
        from += 1
      }
      c += 1
    }
    best
  }
}
