package repro.metrics

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.GraphOps
import repro.partitioners.HDRF

class MetricsSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private lazy val stream = TestGraphs.rmatTiny
  private lazy val k = 4
  private lazy val pids = HDRF().partition(stream, TestGraphs.ctx(stream, k)).pids
  private lazy val edgesDf = GraphOps.toEdgeDf(spark, stream)
  private lazy val assigned = GraphOps.withAssignment(spark, edgesDf, pids).cache()

  test("driver RF equals Spark RF") {
    val driver = Metrics.replicationFactor(stream, pids)
    val sparkRf = Metrics.replicationFactorDf(assigned)
    assert(math.abs(driver - sparkRf) < 1e-9)
  }

  test("Spark per-vertex replication matches DuckDB (oracle)") {
    val reps = assigned.select(col("src").as("vertex"), col("pid"))
      .unionAll(assigned.select(col("dst").as("vertex"), col("pid")))
      .groupBy("vertex").agg(countDistinct("pid").as("reps"))
    Oracle.assertEquivalent(
      reps,
      """SELECT vertex, COUNT(DISTINCT pid) AS reps
        |FROM (SELECT src AS vertex, pid FROM edges
        |      UNION ALL SELECT dst AS vertex, pid FROM edges)
        |GROUP BY vertex""".stripMargin,
      "edges" -> assigned.select("src", "dst", "pid"))
  }

  test("Spark degree computation matches DuckDB (oracle)") {
    val degs = GraphOps.degreesDf(edgesDf)
    Oracle.assertEquivalent(
      degs,
      """SELECT vertex, COUNT(*) AS degree
        |FROM (SELECT src AS vertex FROM edges UNION ALL SELECT dst FROM edges)
        |GROUP BY vertex""".stripMargin,
      "edges" -> edgesDf.select("src", "dst"))
  }

  test("partition loads match DuckDB (oracle)") {
    val loadsDf = assigned.groupBy("pid").agg(count(lit(1)).as("load"))
    Oracle.assertEquivalent(
      loadsDf,
      "SELECT pid, COUNT(*) AS load FROM edges GROUP BY pid",
      "edges" -> assigned.select("src", "dst", "pid"))
  }

  test("replicationByDegree matches DuckDB (oracle)") {
    val rbd = Metrics.replicationByDegree(assigned)
      .select(col("degree"), round(col("avg_reps"), 6).as("avg_reps"), col("num_vertices"))
    Oracle.assertEquivalent(
      rbd,
      """WITH reps AS (
        |  SELECT vertex, COUNT(DISTINCT pid) AS reps
        |  FROM (SELECT src AS vertex, pid FROM edges
        |        UNION ALL SELECT dst AS vertex, pid FROM edges)
        |  GROUP BY vertex),
        |degs AS (
        |  SELECT vertex, COUNT(*) AS degree
        |  FROM (SELECT src AS vertex FROM edges UNION ALL SELECT dst FROM edges)
        |  GROUP BY vertex)
        |SELECT degree, ROUND(AVG(reps), 6) AS avg_reps, COUNT(*) AS num_vertices
        |FROM reps JOIN degs USING (vertex)
        |GROUP BY degree""".stripMargin,
      "edges" -> assigned.select("src", "dst", "pid"))
  }

  test("GraphOps.stats agrees with the driver-side stats helper") {
    val sparkStats = GraphOps.stats(edgesDf)
    val local = TestGraphs.localStats(stream)
    assert(sparkStats.numVertices == local.numVertices)
    assert(sparkStats.numEdges == local.numEdges)
    assert(sparkStats.degrees == local.degrees)
  }

  test("streamEdges preserves stream order") {
    val replayed = GraphOps.streamEdges(edgesDf).toIndexedSeq
    assert(replayed == stream)
  }

  test("collectStream equals streamEdges") {
    assert(GraphOps.collectStream(edgesDf).toIndexedSeq == stream)
  }

  test("loadBalance = k·max/|E|") {
    val loads = Metrics.loads(pids, k)
    assert(Metrics.loadBalance(pids, k) == k.toDouble * loads.max / stream.length)
  }

  test("RF of an all-in-one-partition assignment is exactly 1") {
    val all0 = Array.fill(stream.length)(0)
    assert(Metrics.replicationFactor(stream, all0) == 1.0)
  }

  test("RF of a round-robin assignment is high on a dense graph") {
    val rr = Array.tabulate(stream.length)(_ % k)
    assert(Metrics.replicationFactor(stream, rr) >
           Metrics.replicationFactor(stream, Array.fill(stream.length)(0)))
  }
}
