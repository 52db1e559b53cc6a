package repro.qcut

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PerturbationSpec extends AnyFunSuite {

  private def splitState(delta: Double = 0.75): QCutState = {
    val atoms = Vector(
      Atom(Vector(0), 0, Array(0, 1)),
      Atom(Vector(0), 1, Array(2, 3)),
      Atom(Vector(1), 0, Array(4, 5)),
      Atom(Vector(1), 1, Array(6, 7)))
    QCutState.build(atoms, Array(4L, 4L), k = 2, delta = delta,
      clusterOfQuery = KargerClustering.identityClusters(2))
  }

  test("perturbation merges one spread cluster onto a single worker") {
    val s = splitState()
    val ok = Perturbation.run(s, new Random(1))
    assert(ok)
    val mergedClusters = (0 to 1).count { c =>
      (0 to 1).count(w => s.clusterScope(c, w) > 0) == 1
    }
    assert(mergedClusters >= 1, "at least the selected cluster must be merged")
  }

  test("perturbation re-establishes global balance (step III)") {
    val s = splitState()
    assert(Perturbation.run(s, new Random(2)))
    assert(s.globallyBalanced,
      s"loads after perturbation: ${(0 to 1).map(s.load)} with delta ${s.delta}")
  }

  test("perturbation returns false when no cluster is spread") {
    val atoms = Vector(
      Atom(Vector(0), 0, Array(0, 1)),
      Atom(Vector(1), 1, Array(2, 3)))
    val s = QCutState.build(atoms, Array(2L, 2L), k = 2, delta = 0.75,
      clusterOfQuery = KargerClustering.identityClusters(2))
    assert(!Perturbation.run(s, new Random(3)))
    assert(s.cost === 0L)
  }

  test("perturbation is deterministic in the RNG seed") {
    val a = splitState(); val b = splitState()
    Perturbation.run(a, new Random(7))
    Perturbation.run(b, new Random(7))
    assert((0 until a.atoms.size).map(a.assign(_)) === (0 until b.atoms.size).map(b.assign(_)))
  }

  test("rebalance with preferSmall moves the smallest adequate scope (deterministic)") {
    // Worker 0 holds a big cluster (4 vertices) and a small one (2); with a
    // tight delta the repair must move the small one first.
    val atoms = Vector(
      Atom(Vector(0), 0, Array(0, 1, 2, 3)),
      Atom(Vector(1), 0, Array(4, 5)))
    def mk() = QCutState.build(atoms, Array(6L, 0L), k = 2, delta = 0.8,
      clusterOfQuery = KargerClustering.identityClusters(2))
    val s = mk()
    assert(!s.globallyBalanced)
    Perturbation.rebalance(s, new Random(1), preferSmall = true)
    // Cluster 1 (the small one) must be the first mover: after it, loads are
    // (4+4)/2=4 vs (2+2)/2=2 -> diff/max = 0.5 < 0.8 -> balanced, stop.
    assert(s.clusterScope(1, 1) === 2L, "small cluster should have moved")
    assert(s.clusterScope(0, 0) === 4L, "big cluster should have stayed")
    assert(s.globallyBalanced)
    // Deterministic regardless of RNG seed.
    val t = mk()
    Perturbation.rebalance(t, new Random(99), preferSmall = true)
    assert((0 until atoms.size).map(t.assign(_)) === (0 until atoms.size).map(s.assign(_)))
  }

  test("different seeds can choose different clusters") {
    // Seeds must be spread out: java.util.Random(s).nextInt(2) is identical
    // for thousands of consecutive seeds (the top-bit-of-one-LCG-step trap).
    val results = (0 until 20).map { i =>
      val s = splitState()
      Perturbation.run(s, new Random(i * 100003L))
      (0 until s.atoms.size).map(s.assign(_))
    }
    assert(results.distinct.size > 1, "perturbation should be randomized")
  }
}
