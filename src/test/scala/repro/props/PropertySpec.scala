package repro.props

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.qcut._
import repro.sim.QueryIterStat
import repro.workload.QueryWorkload

/** Property-based invariants (plain ScalaCheck driven from ScalaTest — the
  * scalatestplus bridge is not available offline).
  */
class PropertySpec extends AnyFunSuite {

  private def check(prop: Prop, minTests: Int = 50): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(res.passed, res.status.toString)
  }

  private val genScopes: Gen[Map[Int, Set[Int]]] = for {
    nQ <- Gen.choose(1, 6)
    scopes <- Gen.sequence[List[(Int, Set[Int])], (Int, Set[Int])](
      (0 until nQ).map { q =>
        Gen.nonEmptyContainerOf[Set, Int](Gen.choose(0, 30)).map(s => q -> s)
      })
  } yield scopes.toMap

  private def mkState(scopes: Map[Int, Set[Int]], k: Int): Option[QCutState] = {
    val assign: Int => Int = v => v % k
    val atoms = ScopeAtoms.build(scopes, assign)
    val totals = Array.fill(k)(0L)
    (0 to 30).foreach(v => totals(assign(v)) += 1)
    val qids = atoms.flatMap(_.sig).distinct.sorted
    if (qids.isEmpty) None
    else Some(QCutState.build(atoms, totals, k, 10.0, KargerClustering.identityClusters(qids.size)))
  }

  test("property: atoms partition the union of scopes under any assignment") {
    check(Prop.forAll(genScopes, Gen.choose(1, 5)) { (scopes, k) =>
      val assign: Int => Int = v => v % k
      val atoms = ScopeAtoms.build(scopes, assign)
      val vids = atoms.flatMap(_.vids)
      vids.size == vids.distinct.size &&
        vids.toSet == scopes.values.flatten.toSet &&
        atoms.forall(a => a.vids.forall(v => assign(v) == a.worker))
    })
  }

  test("property: atom-derived local scope sizes match the direct definition") {
    check(Prop.forAll(genScopes, Gen.choose(1, 5)) { (scopes, k) =>
      val assign: Int => Int = v => v % k
      val atoms = ScopeAtoms.build(scopes, assign)
      scopes.forall { case (q, scope) =>
        (0 until k).forall { w =>
          ScopeAtoms.localScopeSize(atoms, q, w) == scope.count(assign(_) == w).toLong
        }
      }
    })
  }

  test("property: QCutState cost is non-negative and bounded by total scope mass") {
    check(Prop.forAll(genScopes, Gen.choose(2, 4)) { (scopes, k) =>
      mkState(scopes, k).forall { s =>
        val mass = scopes.values.map(_.size.toLong).sum
        s.cost >= 0L && s.cost <= mass
      }
    })
  }

  test("property: moveCluster then moving the atoms back restores cost and loads") {
    check(Prop.forAll(genScopes, Gen.choose(2, 4), Gen.choose(0, 100)) { (scopes, k, pick) =>
      mkState(scopes, k).forall { s =>
        val c0 = s.cost
        val loads0 = (0 until k).map(s.load)
        val c = pick % s.nQueries
        (0 until k).find(w => s.clusterScope(c, w) > 0).forall { f =>
          val to = (f + 1) % k
          val moved = s.moveCluster(c, f, to)
          s.moveAtoms(moved, f)
          s.cost == c0 && (0 until k).map(s.load) == loads0
        }
      }
    })
  }

  test("property: everything on one worker has cost 0") {
    check(Prop.forAll(genScopes, Gen.choose(2, 4)) { (scopes, k) =>
      val atoms = ScopeAtoms.build(scopes, _ => 0)
      val totals = Array.fill(k)(0L); totals(0) = 31
      val qids = atoms.flatMap(_.sig).distinct.sorted
      qids.isEmpty || {
        val s = QCutState.build(atoms, totals, k, 10.0, KargerClustering.identityClusters(qids.size))
        s.cost == 0L
      }
    })
  }

  test("property: apportionment always sums to n and is non-negative") {
    val g = repro.TestFixtures.small
    check(Prop.forAll(Gen.choose(1, 500)) { n =>
      val counts = QueryWorkload.apportion(g, n)
      counts.sum == n && counts.forall(_ >= 0)
    })
  }

  test("property: involvedWorkers contains every computing worker; isLocal matches") {
    val genStat = for {
      qid <- Gen.choose(0, 3)
      iter <- Gen.choose(0, 5)
      nw <- Gen.choose(1, 4)
      acts <- Gen.sequence[List[(Int, Int)], (Int, Int)](
        (0 until nw).map(w => Gen.choose(1, 9).map(n => w -> n)))
    } yield QueryIterStat(qid, iter, acts.toMap, Map.empty, 0)
    check(Prop.forAll(genStat) { s =>
      s.actByWorker.keySet.subsetOf(s.involvedWorkers) &&
        s.isLocal == (s.actByWorker.size <= 1)
    })
  }

  test("property: Karger clustering never exceeds the target on connected graphs") {
    check(Prop.forAll(Gen.choose(2, 12), Gen.choose(1, 6), Gen.choose(0L, 1000L)) { (n, target, seed) =>
      val qids = (0 until n).toVector
      val overlaps = (0 until n - 1).map(i => (i, i + 1) -> 5L).toMap // a path: connected
      val c = KargerClustering.cluster(qids, overlaps, target, new scala.util.Random(seed))
      c.distinct.length <= math.max(target, 1) && c.length == n
    })
  }

  test("property: hash partitioner stays in range and is deterministic") {
    val g = repro.TestFixtures.tiny
    check(Prop.forAll(Gen.choose(1, 12)) { k =>
      val a = repro.partition.HashPartitioner.assign(g, k)
      a.forall(w => w >= 0 && w < k) &&
        a.toSeq == repro.partition.HashPartitioner.assign(g, k).toSeq
    }, minTests = 12)
  }

  test("property: grid edge weights are symmetric for arbitrary vertex pairs") {
    val g = repro.TestFixtures.tiny
    check(Prop.forAll(Gen.choose(0, g.numVertices - 2)) { v =>
      g.edgeWeight(v, v + 1) == g.edgeWeight(v + 1, v)
    })
  }
}
