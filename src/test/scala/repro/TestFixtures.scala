package repro

import org.apache.spark.sql.DataFrame
import repro.engine._
import repro.graph.RoadNetwork
import repro.workload.QueryWorkload

/** Shared, lazily-built test data. All suites run in one JVM
  * (`Test / parallelExecution := false`), so expensive artefacts — cached
  * edge tables and engine traces — are built once per test run.
  */
object TestFixtures {

  /** 16x16 grid, 4 cities — the SF=0.01-regime unit-test graph. */
  lazy val tiny: RoadNetwork = RoadNetwork.tiny()

  /** 24x24 grid, 5 cities — used where a little more structure is needed. */
  lazy val small: RoadNetwork = RoadNetwork.generate("small-24", side = 24, nCities = 5, tagRate = 40, seed = 11)

  lazy val tinyEdges: DataFrame = BspEngine.prepareEdges(SparkSpec.shared, tiny)
  lazy val smallEdges: DataFrame = BspEngine.prepareEdges(SparkSpec.shared, small)

  /** 32 intra-urban SSSP queries on `small`, batches of 8. */
  lazy val smallSsspQueries: Vector[Query] =
    QueryWorkload.generate(small, 32, QueryKind.Sssp, batchSize = 8, seed = 5)

  /** Their traces (4 batches). */
  lazy val smallSsspTraces: Vector[BatchTrace] =
    BspEngine.runWorkload(SparkSpec.shared, smallEdges, small.isTagged, smallSsspQueries,
      maxIter = 400, astarSide = Some(small.side))

  /** 16 POI queries on `small`, batches of 8. */
  lazy val smallPoiQueries: Vector[Query] =
    QueryWorkload.generate(small, 16, QueryKind.Poi, batchSize = 8, seed = 6)

  lazy val smallPoiTraces: Vector[BatchTrace] =
    BspEngine.runWorkload(SparkSpec.shared, smallEdges, small.isTagged, smallPoiQueries,
      maxIter = 400, astarSide = Some(small.side))

  /** A hand-built 5-vertex weighted digraph for exact-arithmetic oracle
    * tests (small enough for a DuckDB recursive-CTE shortest path).
    *
    *   0 -> 1 (1.0), 0 -> 2 (4.0), 1 -> 2 (2.0), 1 -> 3 (6.0),
    *   2 -> 3 (3.0), 3 -> 4 (1.0), 2 -> 4 (7.0), 4 -> 0 (2.0)
    *
    * d(0, ·) = [0.0, 1.0, 3.0, 6.0, 7.0].
    */
  val pentaEdges: Seq[(Int, Int, Double)] = Seq(
    (0, 1, 1.0), (0, 2, 4.0), (1, 2, 2.0), (1, 3, 6.0),
    (2, 3, 3.0), (3, 4, 1.0), (2, 4, 7.0), (4, 0, 2.0))

  lazy val pentaEdgesDf: DataFrame = {
    val spark = SparkSpec.shared
    import spark.implicits._
    val df = spark.createDataset(pentaEdges).toDF("src", "dst", "weight").cache()
    df.count()
    df
  }

  val pentaAdjacency: Array[Array[(Int, Double)]] = {
    val adj = Array.fill(5)(scala.collection.mutable.ArrayBuffer.empty[(Int, Double)])
    for ((s, d, w) <- pentaEdges) adj(s) += ((d, w))
    adj.map(_.toArray)
  }
}
